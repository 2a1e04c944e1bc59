package repro.nlp

/** Exact first-order Viterbi decoding over a fixed tag set.
  *
  * Scores are additive: emission(i, tag) + transition(prevTag, tag). The
  * decoder is model-agnostic — callers supply both score functions — so it is
  * reused by training (decode under current weights) and inference.
  */
object Viterbi {

  /** Decode the highest-scoring tag sequence for a sentence of length `n`.
    *
    * @param n          sentence length
    * @param tags       tag inventory
    * @param emission   (position, tagIndex) => score
    * @param transition (prevTagIndex or -1 for start, tagIndex) => score
    */
  def decode(
      n: Int,
      tags: IndexedSeq[String],
      emission: (Int, Int) => Double,
      transition: (Int, Int) => Double,
  ): Vector[String] = {
    require(n > 0, "empty sentence")
    val k    = tags.length
    val delta = Array.ofDim[Double](n, k)
    val back  = Array.ofDim[Int](n, k)

    var t = 0
    while (t < k) {
      delta(0)(t) = emission(0, t) + transition(-1, t)
      back(0)(t)  = -1
      t += 1
    }
    var i = 1
    while (i < n) {
      var cur = 0
      while (cur < k) {
        var bestScore = Double.NegativeInfinity
        var bestPrev  = 0
        var prev      = 0
        while (prev < k) {
          val s = delta(i - 1)(prev) + transition(prev, cur)
          if (s > bestScore) { bestScore = s; bestPrev = prev }
          prev += 1
        }
        delta(i)(cur) = bestScore + emission(i, cur)
        back(i)(cur)  = bestPrev
        cur += 1
      }
      i += 1
    }

    var bestLast = 0
    var bestLastScore = Double.NegativeInfinity
    t = 0
    while (t < k) {
      if (delta(n - 1)(t) > bestLastScore) { bestLastScore = delta(n - 1)(t); bestLast = t }
      t += 1
    }
    val path = new Array[Int](n)
    path(n - 1) = bestLast
    i = n - 1
    while (i > 0) { path(i - 1) = back(i)(path(i)); i -= 1 }
    path.iterator.map(tags).toVector
  }
}
