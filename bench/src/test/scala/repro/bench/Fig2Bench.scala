package repro.bench

import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.exp.Experiments

/** Paper Figure 2 (as a table): percentage mapping of recipes to their
  * nutritional profile at bench scale (SF=0.1 ≈ 11.8k recipes).
  *
  * The paper's figure shows most recipes concentrated at high mapping
  * percentages, with name-level mapping strictly better than name+unit-level
  * mapping — those are the shapes asserted here.
  */
class Fig2Bench extends SparkSpec {

  import spark.implicits._

  private val sf = 0.1

  private lazy val perRecipe =
    Experiments.estimateCorpus(spark, sf, BenchModel.model).cache()
  private lazy val fig2 = Experiments.fig2(spark, perRecipe).cache()

  test("FIGURE 2 — print the mapping distribution") {
    println(s"\nFIGURE 2 — PERCENTAGE MAPPING OF RECIPES (SF=$sf, ${perRecipe.count()} recipes)")
    println(Experiments.render(fig2, n = 50))
  }

  test("distribution covers all recipes at both levels") {
    val total = perRecipe.count()
    val byLevel = fig2.groupBy("level").agg(sum("recipes").as("n")).collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(byLevel("ingredient name") == total)
    assert(byLevel("ingredient + unit") == total)
  }

  test("most recipes sit in the high-mapping buckets (paper's shape)") {
    val high = perRecipe.filter($"pctNameMapped" >= 80.0).count()
    assert(high.toDouble / perRecipe.count() > 0.6,
      s"only $high/${perRecipe.count()} recipes ≥80% name-mapped")
  }

  test("name-level mapping dominates name+unit-level mapping") {
    val bad = perRecipe.filter($"pctFullyMapped" > $"pctNameMapped").count()
    assert(bad == 0)
    val meanName = perRecipe.agg(avg($"pctNameMapped")).collect().head.getDouble(0)
    val meanFull = perRecipe.agg(avg($"pctFullyMapped")).collect().head.getDouble(0)
    println(f"mean pct name-mapped: $meanName%.2f%%   mean pct fully-mapped: $meanFull%.2f%%")
    assert(meanName >= meanFull)
    assert(meanName > 85.0, f"mean name-mapped $meanName%.2f%% too low")
  }

  test("a visible fraction of recipes is 100% fully mapped (error cohort)") {
    val full = perRecipe.filter($"nFullyMapped" === $"nLines").count()
    // The paper evaluates calories on the fully-mapped cohort (2482 recipes).
    assert(full > 0, "no recipe is 100% mapped")
    println(s"fully-mapped recipes: $full of ${perRecipe.count()}")
  }
}
