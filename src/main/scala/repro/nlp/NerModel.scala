package repro.nlp

/** A trained sequence-tagging model: emission weights per (feature, tag) and
  * transition weights per (prevTag, tag). Immutable and serializable so it
  * can be broadcast into a Spark UDF and applied corpus-wide.
  *
  * @param emitW  feature -> per-tag weight array (aligned with NerFeatures.Tags)
  * @param transW (k+1) x k matrix; row k is the start-transition
  */
final class NerModel(
    val emitW: Map[String, Array[Double]],
    val transW: Array[Array[Double]],
) extends Serializable {

  private val tags = NerFeatures.Tags
  private val k    = tags.length

  /** Tag a tokenized phrase. */
  def tag(tokens: IndexedSeq[String]): Vector[String] = {
    if (tokens.isEmpty) return Vector.empty
    val feats = Array.tabulate(tokens.length)(i => NerFeatures.featuresAt(tokens, i))
    def emission(i: Int, t: Int): Double = {
      var s  = 0.0
      val fs = feats(i)
      var j  = 0
      while (j < fs.length) {
        val w = emitW.getOrElse(fs(j), null)
        if (w != null) s += w(t)
        j += 1
      }
      s
    }
    def transition(prev: Int, cur: Int): Double =
      if (prev < 0) transW(k)(cur) else transW(prev)(cur)
    Viterbi.decode(tokens.length, tags, emission, transition)
  }
}
