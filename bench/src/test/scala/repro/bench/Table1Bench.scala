package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Table I: NER tag extraction on the Piroszhki phrases.
  *
  * Paper's reported extractions (name | state | qty | unit | temp | df | size):
  *   beef | ground lean | 1/2 | lb, onion | chopped | 1 | small, egg |
  *   hard-cooked chopped | 1, dill weed | fresh | 1 tablespoon, salt | 1/2
  *   teaspoon, black pepper | 1/8 teaspoon, butter | softened | 3/4 cup,
  *   purpose flour | 2 cups, salt | 1 teaspoon, cream | sour low fat | 1/2
  *   cup, egg yolk | 1, cold water | 1 tablespoon (temp=cold).
  */
class Table1Bench extends SparkSpec {

  private lazy val rows = Experiments.table1(spark, BenchModel.model)
    .collect().map(r => r.getString(0) ->
      (r.getString(1), r.getString(2), r.getString(3), r.getString(4),
       r.getString(5), r.getString(6), r.getString(7))).toMap

  test("TABLE I — print extraction for the twelve Piroszhki phrases") {
    println(s"\nNER held-out F1 = ${"%.4f".format(BenchModel.holdoutF1)}  [paper: 0.95]")
    println("TABLE I — INGREDIENT TAGS EXTRACTION (measured)")
    println(Experiments.render(Experiments.table1(spark, BenchModel.model)))
  }

  test("beef row: '1/2 lb lean ground beef'") {
    val (name, state, qty, unit, _, _, _) = rows("1/2 lb lean ground beef")
    assert(name == "beef")
    assert(state.split(" ").toSet == Set("lean", "ground"))
    assert(qty == "1/2" && unit == "lb")
  }

  test("onion row: size=small, state=chopped") {
    val (name, state, qty, _, _, _, size) = rows("1 small onion , finely chopped")
    assert(name.startsWith("onion"))
    assert(state == "chopped")
    assert(qty == "1" && size == "small")
  }

  test("dill weed row: df=fresh, unit=tablespoon") {
    val (name, _, qty, unit, _, df, _) = rows("1 tablespoon fresh dill weed")
    assert(name == "dill weed" && df == "fresh")
    assert(qty == "1" && unit == "tablespoon")
  }

  test("butter-or-margarine row keeps the first alternative") {
    val (name, _, qty, unit, _, _, _) = rows("3/4 cup butter or 3/4 cup margarine , softened")
    assert(name == "butter")
    assert(qty == "3/4" && unit == "cup")
  }

  test("cold water row: temp=cold") {
    val (name, _, _, unit, temp, _, _) = rows("1 tablespoon cold water")
    assert(name == "water" && temp == "cold" && unit == "tablespoon")
  }

  test("egg yolk row: quantity-only, no unit") {
    val (name, _, qty, unit, _, _, _) = rows("1 egg yolk")
    assert(name == "egg yolk" && qty == "1" && unit == "")
  }

  test("every phrase yields a non-empty name and quantity") {
    Experiments.PiroszhkiPhrases.foreach { p =>
      val (name, _, qty, _, _, _, _) = rows(p)
      assert(name.nonEmpty, s"no name for '$p'")
      assert(qty.nonEmpty, s"no quantity for '$p'")
    }
  }
}
