package repro.exp

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestModels}
import repro.data.RecipeData

/** The experiment layer shared by jobs and benches, at unit-test scale. */
class ExperimentsSpec extends SparkSpec {

  import spark.implicits._

  test("table1 produces one row per Piroszhki phrase") {
    val t1 = Experiments.table1(spark, TestModels.ner)
    assert(t1.count() == 12)
    assert(t1.columns.toSeq ==
      Seq("phrase", "name", "state", "quantity", "unit", "temp", "df", "size"))
  }

  test("table3 produces one row per paper row with both metrics") {
    val t3 = Experiments.table3(spark).collect()
    assert(t3.length == Experiments.TableIIIRows.length)
    t3.foreach { r =>
      assert(r.getString(2).nonEmpty) // modified match
      assert(r.getString(4).nonEmpty) // vanilla match
    }
  }

  test("table4 is the cleaned butter weight table") {
    val t4 = Experiments.table4(spark).collect()
    assert(t4.length == 4)
    assert(t4.map(_.getString(3)).toSeq == Seq("pat", "tablespoon", "cup", "stick"))
  }

  test("fig2 buckets are exhaustive and percentages sum to 100 per level") {
    val perRecipe = Seq(
      (1L, 100.0, 100.0), (2L, 100.0, 80.0), (3L, 95.0, 50.0),
      (4L, 60.0, 0.0), (5L, 100.0, 100.0),
    ).toDF("recipeId", "pctNameMapped", "pctFullyMapped")
    val f = Experiments.fig2(spark, perRecipe).cache()
    val sums = f.groupBy("level").agg(
      sum($"recipes").as("n"), round(sum($"pctOfRecipes"), 1).as("pct")).collect()
    sums.foreach { r =>
      assert(r.getLong(1) == 5)
      assert(math.abs(r.getDouble(2) - 100.0) < 0.2)
    }
    // 100% is its own bucket, separate from 90-100.
    val name100 = f.filter($"level" === "ingredient name" && $"bucket" === "100")
      .collect().head.getLong(1)
    assert(name100 == 3)
    val name90 = f.filter($"level" === "ingredient name" && $"bucket" === "90-100")
      .collect().head.getLong(1)
    assert(name90 == 1)
  }

  test("trainNer returns a usable model and sane holdout F1") {
    val (model, f1, corpus) = Experiments.trainNer(spark, nPhrases = 600, epochs = 4, seed = 5)
    assert(corpus.size == 600)
    assert(f1 > 0.80 && f1 <= 1.0, s"holdout F1 $f1")
    assert(model.tag(IndexedSeq("2", "cups", "milk")).head == "QUANTITY")
  }

  test("results computes all §III scalars at tiny scale") {
    val r = Experiments.results(spark, sf = 0.001, nerPhrases = 600, cvFolds = 2, seed = 3)
    assert(r.nerCvF1s.length == 2)
    assert(r.nUniqueIngredients > 0)
    assert(r.uniqueMatchRatePct > 50.0 && r.uniqueMatchRatePct <= 100.0)
    assert(r.divergenceSampleSize > 0 && r.divergenceSampled <= r.divergenceSampleSize)
    assert(r.accuracyTopK > 0 && r.accuracyTopKCorrect <= r.accuracyTopK)
    assert(r.nFullyMappedRecipes <= r.nRecipes)
    assert(!r.maePerServingKcal.isNaN)
  }

  test("render produces an aligned text table") {
    val s = Experiments.render(Seq((1, "a"), (22, "bb")).toDF("x", "y"))
    assert(s.contains("| x "))
    assert(s.linesIterator.size == 4)
  }

  test("estimateCorpus returns one row per recipe") {
    val out = Experiments.estimateCorpus(spark, 0.0005, TestModels.ner, seed = 9)
    val expected = RecipeData.recipes(spark, 0.0005, seed = 9).count()
    assert(out.count() == expected)
  }
}
