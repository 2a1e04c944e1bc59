package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Table III: descriptions inferred with modified vs vanilla Jaccard.
  *
  * Where the paper's method description determines the outcome, our matcher
  * must agree with the paper's modified-JI column. Two rows diverge by
  * analysis (documented in EXPERIMENTS.md): 'roma tomato' (priority tie-break
  * favours the head-term match 'Tomato products, …') and 'sesame seeds'
  * (priority favours 'Seeds, sesame seeds, …' — the match the paper itself
  * calls more suitable). The paper's vanilla column is only partially
  * derivable from its stated preprocessing; we assert the rows that are.
  */
class Table3Bench extends SparkSpec {

  private lazy val table = Experiments.table3(spark).collect()
    .map(r => (r.getString(0), r.getString(1)) ->
      (r.getString(2), r.getString(3), r.getString(4), r.getString(5))).toMap

  private def measured(name: String, state: String = ""): (String, String) = {
    val (m, _, v, _) = table((name, state))
    (m, v)
  }

  test("TABLE III — print measured vs paper matches") {
    println("\nTABLE III — MODIFIED vs VANILLA JACCARD (measured | paper)")
    println(Experiments.render(Experiments.table3(spark)))
    val agreeMod = table.values.count { case (m, pm, _, _) => m == pm }
    val agreeVan = table.values.count { case (_, _, v, pv) => v == pv }
    println(s"modified-JI column agreement with paper: $agreeMod/${table.size}")
    println(s"vanilla-JI column agreement with paper:  $agreeVan/${table.size}")
  }

  private val modifiedExpected = Seq(
    ("red lentils", "")          -> "Lentils, pink or red, raw",
    ("coriander", "ground")      -> "Coriander (cilantro) leaves, raw",
    ("tomato paste", "")         -> "Tomato products, canned, paste, without salt added",
    ("vegetable broth", "")      -> "Soup, vegetable with beef broth, canned, condensed",
    ("fava beans", "")           -> "Broadbeans (fava beans), mature seeds, raw",
    ("cayenne pepper", "ground") -> "Spices, pepper, red or cayenne",
    ("chicken with giblets", "") -> "Chicken, broilers or fryers, meat and skin and giblets and neck, raw",
  )
  modifiedExpected.foreach { case ((n, s), expect) =>
    test(s"modified JI: '$n' → '${expect.take(40)}…' (paper row)") {
      assert(measured(n, s)._1 == expect)
    }
  }

  private val vanillaExpected = Seq(
    ("vegetable broth", "") -> "Soup, vegetable broth, ready to serve",
    ("fava beans", "")      -> "Beans, fava, in pod, raw",
    ("sesame seeds", "")    -> "Seeds, sesame seeds, whole, dried",
  )
  vanillaExpected.foreach { case ((n, s), expect) =>
    test(s"vanilla JI: '$n' → '${expect.take(40)}…' (paper row)") {
      assert(measured(n, s)._2 == expect)
    }
  }

  test("metrics disagree on several rows (the paper's 227/1000 effect)") {
    val differing = table.values.count { case (m, _, v, _) => m != v }
    assert(differing >= 3, s"only $differing/${table.size} rows differ")
  }

  test("modified JI prefers the longer, more detailed description overall") {
    val (mLens, vLens) = table.values.map { case (m, _, v, _) => (m.length, v.length) }.unzip
    assert(mLens.sum >= vLens.sum, "modified JI no longer favours detailed descriptions")
  }

  test("majority of modified-JI rows agree with the paper's column") {
    val agree = table.values.count { case (m, pm, _, _) => m == pm }
    assert(agree >= 7, s"only $agree/9 modified rows agree with the paper")
  }
}
