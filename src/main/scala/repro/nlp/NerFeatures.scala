package repro.nlp

/** Feature extraction for the ingredient-phrase sequence tagger (§II-A).
  *
  * Emulates the CRF feature templates of Stanford NER that matter on this
  * domain: token identity, lemma, word shape, numeric-ness, affixes,
  * neighbouring words, lexicon membership, and coarse POS. Transition
  * structure (previous tag) is handled by the decoder, not here.
  */
object NerFeatures {

  /** The NER tag inventory (paper §II-A) plus the outside tag. */
  val Tags: Vector[String] =
    Vector("NAME", "STATE", "QUANTITY", "UNIT", "TEMP", "DF", "SIZE", "O")

  private[nlp] val unitLexicon = Set(
    "cup", "cups", "tablespoon", "tablespoons", "tbsp", "teaspoon",
    "teaspoons", "tsp", "pound", "pounds", "lb", "lbs", "ounce", "ounces",
    "oz", "gram", "grams", "g", "kg", "kilogram", "kilograms", "ml",
    "milliliter", "milliliters", "liter", "liters", "l", "pint", "pints",
    "quart", "quarts", "gallon", "gallons", "clove", "cloves", "can", "cans",
    "package", "packages", "pkg", "slice", "slices", "stick", "sticks",
    "pinch", "dash", "bunch", "sprig", "sprigs", "head", "heads", "stalk",
    "stalks", "piece", "pieces", "jar", "jars", "bottle", "fluid", "floz",
    "whole", "patty", "patties", "pat", "pats",
  )
  private[nlp] val sizeLexicon  = Set("small", "medium", "large", "jumbo", "extra-large")
  private[nlp] val tempLexicon  = Set("cold", "hot", "warm", "chilled", "boiling", "lukewarm", "iced", "frozen")
  private[nlp] val dfLexicon    = Set("fresh", "dried", "dry", "freshly")
  private[nlp] val stateLexicon = Set(
    "chopped", "minced", "diced", "sliced", "grated", "shredded", "ground",
    "melted", "softened", "beaten", "peeled", "crushed", "drained", "rinsed",
    "cooked", "uncooked", "hard-cooked", "toasted", "roasted", "quartered",
    "halved", "trimmed", "thawed", "sifted", "mashed", "cubed", "lean",
    "sour", "low-fat", "low", "fat", "whipped", "packed", "crumbled",
  )

  private val numericRe = "^\\d+([./-]\\d+)*$".r

  private def shape(t: String): String =
    t.map { c =>
      if (c.isDigit) 'd' else if (c.isUpper) 'X' else if (c.isLower) 'x' else c
    }.mkString

  /** Local (emission) features for position `i` of `tokens`. */
  def featuresAt(tokens: IndexedSeq[String], i: Int): Array[String] = {
    val t     = tokens(i)
    val lower = t.toLowerCase
    val prev  = if (i > 0) tokens(i - 1).toLowerCase else "<s>"
    val next  = if (i < tokens.length - 1) tokens(i + 1).toLowerCase else "</s>"
    val buf   = scala.collection.mutable.ArrayBuffer[String](
      "bias",
      s"w=$lower",
      s"lem=${Lemmatizer.lemma(lower)}",
      s"shape=${shape(t)}",
      s"pos=${PosTagger.tag(t)}",
      s"prev=$prev",
      s"next=$next",
      s"prev+w=$prev|$lower",
      s"w+next=$lower|$next",
    )
    if (numericRe.findFirstIn(lower).isDefined) buf += "isNum"
    if (i == 0) buf += "first"
    if (i == tokens.length - 1) buf += "last"
    if (lower.contains("-")) buf += "hyphen"
    if (unitLexicon.contains(lower))  buf += "inUnitLex"
    if (sizeLexicon.contains(lower))  buf += "inSizeLex"
    if (tempLexicon.contains(lower))  buf += "inTempLex"
    if (dfLexicon.contains(lower))    buf += "inDFLex"
    if (stateLexicon.contains(lower)) buf += "inStateLex"
    if (lower.length >= 3) { buf += s"suf3=${lower.takeRight(3)}"; buf += s"pre3=${lower.take(3)}" }
    buf.toArray
  }
}
