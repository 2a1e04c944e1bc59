package repro.nlp

/** Coarse rule-based part-of-speech tagger, standing in for the POS tagger
  * the paper uses to build tag-frequency vectors for corpus selection
  * (§II-A). Only the tag *frequencies* feed downstream KMeans, so a compact
  * lexicon + suffix tagger over a coarse tag set preserves the clustering
  * geometry the selection relies on.
  */
object PosTagger {

  /** The coarse tag inventory, in a fixed order so frequency vectors align. */
  val TagSet: Vector[String] = Vector("CD", "NN", "JJ", "VBD", "IN", "CC", "DT", "PUNCT")

  private val prepositions = Set("of", "with", "in", "on", "for", "to", "at", "from", "into", "per")
  private val conjunctions = Set("or", "and", "plus")
  private val determiners  = Set("a", "an", "the", "each", "some")
  private val adjectives   = Set(
    "small", "medium", "large", "fresh", "dry", "dried", "cold", "hot", "warm",
    "lean", "low", "fat", "whole", "raw", "ripe", "extra", "light", "dark",
    "sweet", "sour", "salted", "unsalted", "boneless", "skinless", "thick",
    "thin", "fine", "coarse", "soft", "hard", "frozen", "canned", "plain",
  )
  private val pastVerbs = Set(
    "chopped", "minced", "diced", "sliced", "grated", "shredded", "ground",
    "melted", "softened", "beaten", "peeled", "crushed", "drained", "rinsed",
    "cooked", "uncooked", "toasted", "roasted", "packed", "divided", "cut",
    "quartered", "halved", "trimmed", "thawed", "sifted", "mashed", "cubed",
  )

  private val numeric = "^\\d+([./-]\\d+)*$".r

  /** Tag one token. */
  def tag(token: String): String = {
    val t = token.toLowerCase
    if (t.isEmpty) "PUNCT"
    else if (numeric.findFirstIn(t).isDefined) "CD"
    else if (!t.exists(_.isLetterOrDigit)) "PUNCT"
    else if (prepositions.contains(t)) "IN"
    else if (conjunctions.contains(t)) "CC"
    else if (determiners.contains(t)) "DT"
    else if (pastVerbs.contains(t) || t.endsWith("ed")) "VBD"
    else if (adjectives.contains(t) || t.endsWith("ly") || t.endsWith("less")) "JJ"
    else "NN"
  }

  /** Tag-frequency vector of a tokenized phrase, aligned with [[TagSet]]. */
  def frequencyVector(tokens: Seq[String]): Array[Double] = {
    val counts = tokens.map(tag).groupBy(identity).view.mapValues(_.size.toDouble).toMap
    TagSet.map(t => counts.getOrElse(t, 0.0)).toArray
  }
}
