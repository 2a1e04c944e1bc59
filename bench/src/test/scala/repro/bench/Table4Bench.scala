package repro.bench

import repro.SparkSpec
import repro.exp.Experiments

/** Paper Table IV: ingredient and unit relations for Butter,salted. */
class Table4Bench extends SparkSpec {

  private lazy val rows = Experiments.table4(spark).collect()
    .map(r => (r.getInt(1), r.getDouble(2), r.getString(3), r.getDouble(4), r.getDouble(5)))

  test("TABLE IV — print cleaned unit relations") {
    println("\nTABLE IV — INGREDIENT AND UNIT RELATIONS (measured; paper identical)")
    println(Experiments.render(Experiments.table4(spark)))
  }

  test("rows match the paper exactly (after §II-C cleaning)") {
    // Paper: pat 5.0, tbsp 14.2, cup 227.0, stick 113.0 — one row each,
    // amount 1.0, gram_per_amount = grams.
    assert(rows.toSeq == Seq(
      (1, 1.0, "pat", 5.0, 5.0),
      (2, 1.0, "tablespoon", 14.2, 14.2),
      (3, 1.0, "cup", 227.0, 227.0),
      (4, 1.0, "stick", 113.0, 113.0),
    ))
  }

  test("noisy source strings were cleaned (no parentheses survive)") {
    rows.foreach { case (_, _, unit, _, _) => assert(unit.matches("[a-z]+")) }
  }

  test("gram_per_amount = grams / amount on every row") {
    rows.foreach { case (_, amount, _, grams, gpa) =>
      assert(math.abs(gpa - grams / amount) < 1e-9)
    }
  }
}
