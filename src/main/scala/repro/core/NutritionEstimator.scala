package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.nlp.NerModel

/** End-to-end nutritional profile estimation (Figure 1's system
  * architecture): NER extraction → closest-description annotation over the
  * *unique* ingredients → unit matching → per-line nutrient calculation →
  * per-recipe aggregation.
  *
  * Matching runs on distinct (name, state, temp, df) tuples — the paper's
  * unit of account ("94.49% of the unique ingredients") — and the result is
  * joined back onto the full corpus, so the expensive token join scales with
  * vocabulary, not corpus size.
  */
object NutritionEstimator {

  /** Structured per-line estimate.
    *
    * @param lines   columns: recipeId, lineNo, phrase, servings
    * @param model   trained NER model
    * @param foods   USDA foods: ndbId, description, kcal100g, …
    * @param weights USDA gram weights
    * @return per-line DataFrame with name/state/…, ndbId, description,
    *         grams, estKcal, nameMapped, fullyMapped
    */
  def perLine(lines: DataFrame, model: NerModel,
              foods: DataFrame, weights: DataFrame): DataFrame = {
    val annotated = NerPipeline.annotate(model, lines).cache()

    val uniqueIngredients = annotated
      .select("name", "state", "temp", "df")
      .distinct()
      .withColumn("ingId", xxhash64(col("name"), col("state"), col("temp"), col("df")))

    val matched = JaccardMatcher
      .matchBest(uniqueIngredients, foods.select("ndbId", "description"), JaccardMatcher.Modified)
      .select(col("ingId"), col("ndbId"), col("score"))

    val withFood = annotated
      .withColumn("ingId", xxhash64(col("name"), col("state"), col("temp"), col("df")))
      .join(matched, Seq("ingId"), "left")

    val resolved = UnitMatcher.resolve(withFood, weights)

    resolved
      .join(foods.select(col("ndbId"), col("description"), col("kcal100g"),
                         col("protein100g"), col("fat100g"), col("carb100g")),
            Seq("ndbId"), "left")
      .withColumn("estKcal",    col("grams") * col("kcal100g") / 100.0)
      .withColumn("estProtein", col("grams") * col("protein100g") / 100.0)
      .withColumn("estFat",     col("grams") * col("fat100g") / 100.0)
      .withColumn("estCarb",    col("grams") * col("carb100g") / 100.0)
      .withColumn("nameMapped", col("ndbId").isNotNull)
      .withColumn("fullyMapped", col("ndbId").isNotNull && col("unitResolved"))
  }

  /** Per-recipe nutritional profile plus mapping statistics.
    *
    * @return recipeId, servings, nLines, nNameMapped, nFullyMapped,
    *         pctNameMapped, pctFullyMapped, estKcal, estKcalPerServing (and
    *         protein/fat/carb totals)
    */
  def perRecipe(perLineDf: DataFrame): DataFrame =
    perLineDf
      .groupBy(col("recipeId"), col("servings"))
      .agg(
        count(lit(1)).as("nLines"),
        sum(when(col("nameMapped"), 1).otherwise(0)).as("nNameMapped"),
        sum(when(col("fullyMapped"), 1).otherwise(0)).as("nFullyMapped"),
        sum(coalesce(col("estKcal"), lit(0.0))).as("estKcal"),
        sum(coalesce(col("estProtein"), lit(0.0))).as("estProtein"),
        sum(coalesce(col("estFat"), lit(0.0))).as("estFat"),
        sum(coalesce(col("estCarb"), lit(0.0))).as("estCarb"),
      )
      .withColumn("pctNameMapped",  col("nNameMapped") * 100.0 / col("nLines"))
      .withColumn("pctFullyMapped", col("nFullyMapped") * 100.0 / col("nLines"))
      .withColumn("estKcalPerServing", col("estKcal") / col("servings"))

  /** Full pipeline: lines in, per-recipe profiles out. */
  def estimate(lines: DataFrame, model: NerModel,
               foods: DataFrame, weights: DataFrame): DataFrame =
    perRecipe(perLine(lines, model, foods, weights))
}
