package repro.core

import repro.nlp.Lemmatizer

/** Text normalization shared by both sides of the description matcher
  * (§II-B): lowercase, tokenize, stop-word removal, lemmatization, and
  * negation normalization ("unsalted" → "not salt", "without" → "not").
  *
  * Food-description preprocessing additionally keeps the comma-group index of
  * every token as its *priority* — USDA-SR descriptions are comma-separated
  * terms of decreasing importance (heuristic (a)), and priorities feed the
  * sequential tie-break (heuristic (h)).
  */
object TextPrep {

  /** A description token with the sequence number of its comma group. */
  final case class PrioToken(token: String, priority: Int)

  private val stopwords = Set(
    "a", "an", "the", "or", "and", "with", "in", "on", "for", "to",
    "from", "by", "as", "at", "of", "per", "into",
  )

  /** Words whose "un"/"non" prefix negates the remainder (heuristic (f)). */
  private val negationPrefixes = Seq("un", "non")

  /** Standalone negation terms, all normalized to "not". */
  private val negationWords = Set("without", "not", "no")

  private def splitWords(s: String): Seq[String] =
    s.toLowerCase.split("[^a-z0-9%]+").iterator.filter(_.nonEmpty).toSeq

  /** Strip a trailing participle suffix after removing a negation prefix,
    * so "unsalted" → "salt" and "unsweetened" → "sweeten".
    */
  private def stripParticiple(w: String): String =
    if (w.endsWith("ed") && w.length > 4) w.dropRight(2) else w

  /** Expand one raw token into its normalized tokens (0, 1 or 2 of them). */
  private def normalizeToken(w: String): Seq[String] = {
    if (stopwords.contains(w)) Seq.empty
    else if (negationWords.contains(w)) Seq("not")
    else {
      negationPrefixes.find(p => w.startsWith(p) && w.length > p.length + 2) match {
        case Some(p) if w.endsWith("ed") || w == p + "cooked" =>
          // Only de-prefix clear participles ("unsalted", "uncooked") —
          // not ordinary words that happen to start with "un"/"non".
          Seq("not", Lemmatizer.lemma(stripParticiple(w.drop(p.length))))
        case _ => Seq(Lemmatizer.lemma(w))
      }
    }
  }

  /** Preprocess the ingredient side (set A): the extracted NAME joined with
    * STATE, TEMP and DRY/FRESH entities (heuristic (d)), normalized into a
    * deduplicated token set.
    */
  def prepIngredient(name: String, state: String = "", temp: String = "", df: String = ""): Set[String] =
    Seq(name, state, temp, df)
      .filter(s => s != null && s.nonEmpty)
      .flatMap(splitWords)
      .flatMap(normalizeToken)
      .toSet

  /** Preprocess a food description (set B), keeping per-token priority =
    * index of its comma-separated term (0 is most important). When a token
    * appears in several terms the smallest priority wins.
    */
  def prepDescription(desc: String): Seq[PrioToken] = {
    val groups = desc.split(",").toSeq.zipWithIndex
    val pairs = for {
      (grp, pri) <- groups
      raw        <- splitWords(grp)
      tok        <- normalizeToken(raw)
    } yield (tok, pri)
    pairs
      .groupBy(_._1)
      .map { case (tok, ps) => PrioToken(tok, ps.map(_._2).min) }
      .toSeq
      .sortBy(_.priority)
  }

  /** Whether the description contains the literal token "raw" (heuristic (g)). */
  def descriptionHasRaw(desc: String): Boolean =
    splitWords(desc).contains("raw")
}
