package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Closest-description annotation via string-similarity matching (§II-B).
  *
  * Implements both metrics of the paper:
  *  - **modified Jaccard** (the contribution): J*(A,B) = |A∩B| / |A|, which
  *    removes the vanilla index's bias against long, detailed USDA
  *    descriptions (heuristic (e));
  *  - **vanilla Jaccard** (the baseline): J(A,B) = |A∩B| / |A∪B|.
  *
  * A is the preprocessed token set of the ingredient name joined with its
  * STATE/TEMP/DRY-FRESH entities (heuristic (d)); B the preprocessed token
  * set of a USDA description, each token carrying the sequence number of its
  * comma group (heuristics (a),(h)). Preprocessing is lemmatization,
  * stop-word removal, uniform casing (b) and negation normalization (f).
  *
  * Collision resolution (heuristics (g),(h),(i)), applied in order:
  *   score desc → raw-provision bonus desc → best matched-term priority asc
  *   → NDB index asc (first match in database order).
  *
  * Dataflow: both sides are exploded to (id, token) rows and joined on the
  * token — an inverted-index join — so cost is proportional to the number of
  * shared-token pairs, never |ingredients| × |foods|.
  */
object JaccardMatcher {

  sealed trait Metric
  case object Modified extends Metric
  case object Vanilla  extends Metric

  private val prepIngredientUdf = udf { (name: String, state: String, temp: String, df: String) =>
    TextPrep.prepIngredient(name, state, temp, df).toSeq
  }
  private val prepDescriptionUdf = udf { (desc: String) =>
    TextPrep.prepDescription(desc).map(pt => (pt.token, pt.priority))
  }
  private val hasRawUdf = udf { (desc: String) => TextPrep.descriptionHasRaw(desc) }

  /** Score every (ingredient, candidate description) pair that shares at
    * least one token, under both metrics.
    *
    * @param ingredients columns: ingId, name, state, temp, df (strings)
    * @param reference   columns: ndbId, description
    * @return ingId, ndbId, inter, aSize, bSize, bestPriority, rawBonus,
    *         jstar, jvanilla
    */
  def scoreCandidates(ingredients: DataFrame, reference: DataFrame): DataFrame = {
    val a = ingredients
      .withColumn("aTokens", prepIngredientUdf(col("name"), col("state"), col("temp"), col("df")))
      .withColumn("aSize", size(col("aTokens")))
      .withColumn("noState", col("state").isNull || col("state") === "")
      .select("ingId", "aTokens", "aSize", "noState")

    val b = reference
      .withColumn("bTokens", prepDescriptionUdf(col("description")))
      .withColumn("bSize", size(col("bTokens")))
      .withColumn("hasRaw", hasRawUdf(col("description")))
      .select("ndbId", "bTokens", "bSize", "hasRaw")

    val aTok = a.select(col("ingId"), explode(col("aTokens")).as("token"))
    val bTok = b.select(col("ndbId"), col("bSize"), col("hasRaw"),
                        explode(col("bTokens")).as("tp"))
      .select(col("ndbId"), col("bSize"), col("hasRaw"),
              col("tp._1").as("token"), col("tp._2").as("priority"))

    aTok.join(bTok, "token")
      .groupBy(col("ingId"), col("ndbId"))
      .agg(
        count(lit(1)).as("inter"),
        min(col("priority")).as("bestPriority"),
        first(col("bSize")).as("bSize"),
        first(col("hasRaw")).as("hasRaw"),
      )
      .join(a.select("ingId", "aSize", "noState"), "ingId")
      .withColumn("rawBonus",
        when(col("hasRaw") && col("noState"), lit(1)).otherwise(lit(0)))
      .withColumn("jstar", col("inter") / col("aSize"))
      .withColumn("jvanilla", col("inter") / (col("aSize") + col("bSize") - col("inter")))
      .drop("hasRaw", "noState")
  }

  /** Best match per ingredient under the chosen metric. Ingredients sharing
    * no token with any description are absent from the result (unmapped —
    * the paper reports 94.49% of unique ingredients mapped).
    *
    * @return ingId, ndbId, score, inter, aSize, bestPriority
    */
  def matchBest(ingredients: DataFrame, reference: DataFrame, metric: Metric = Modified): DataFrame = {
    val scored   = scoreCandidates(ingredients, reference)
    val scoreCol = metric match {
      case Modified => col("jstar")
      case Vanilla  => col("jvanilla")
    }
    val w = Window.partitionBy(col("ingId")).orderBy(
      scoreCol.desc, col("rawBonus").desc, col("bestPriority").asc, col("ndbId").asc)
    scored
      .withColumn("rank", row_number().over(w))
      .filter(col("rank") === 1)
      .select(col("ingId"), col("ndbId"), scoreCol.as("score"),
              col("inter"), col("aSize"), col("bestPriority"))
  }

  /** Convenience: best match joined with the matched description text. */
  def matchBestWithDescription(ingredients: DataFrame, reference: DataFrame,
                               metric: Metric = Modified): DataFrame =
    matchBest(ingredients, reference, metric)
      .join(reference.select(col("ndbId"), col("description")), "ndbId")
}
