package repro.core

/** Quantity normalization (§II-C): every textual quantity is reduced to one
  * numerical value — '2-4' averages to 3, '2 1/2' becomes 2.5, '1/2' becomes
  * 0.5, '500' stays 500. Unparseable input yields None (never throws).
  */
object QuantityParser {

  private val fraction = "^(\\d+)\\s*/\\s*(\\d+)$".r
  private val mixed    = "^(\\d+)\\s+(\\d+)\\s*/\\s*(\\d+)$".r
  private val range    = "^(\\d+(?:\\.\\d+)?)\\s*-\\s*(\\d+(?:\\.\\d+)?)$".r
  private val plain    = "^(\\d+(?:\\.\\d+)?)$".r

  /** Parse a single quantity token or phrase-level quantity string. */
  def parse(raw: String): Option[Double] = {
    if (raw == null) return None
    raw.trim match {
      case ""                 => None
      case mixed(w, n, d)     => safeDiv(n, d).map(_ + w.toDouble)
      case fraction(n, d)     => safeDiv(n, d)
      case range(lo, hi)      => Some((lo.toDouble + hi.toDouble) / 2.0)
      case plain(v)           => Some(v.toDouble)
      case multi if multi.split("\\s+").length > 1 =>
        // Multi-token quantity spans from NER that the mixed-number pattern
        // did not recognize ("500 1" from "500 g or 1 cup"): keep the
        // leading number.
        parse(multi.split("\\s+").head)
      case _                  => None
    }
  }

  private def safeDiv(n: String, d: String): Option[Double] = {
    val den = d.toDouble
    if (den == 0) None else Some(n.toDouble / den)
  }

  /** Render a double the way recipe text does, for the synthetic generator:
    * 0.5 → "1/2", 2.5 → "2 1/2", 3.0 → "3".
    */
  def render(q: Double): String = {
    val whole = q.toLong
    val frac  = q - whole
    val fracStr = frac match {
      case f if math.abs(f - 0.5) < 1e-9   => "1/2"
      case f if math.abs(f - 0.25) < 1e-9  => "1/4"
      case f if math.abs(f - 0.75) < 1e-9  => "3/4"
      case f if math.abs(f - 1.0/3) < 1e-9 => "1/3"
      case f if math.abs(f - 2.0/3) < 1e-9 => "2/3"
      case f if math.abs(f - 0.125) < 1e-9 => "1/8"
      case f if f < 1e-9                   => ""
      case f                               => return q.toString
    }
    if (fracStr.isEmpty) whole.toString
    else if (whole == 0) fracStr
    else s"$whole $fracStr"
  }
}
