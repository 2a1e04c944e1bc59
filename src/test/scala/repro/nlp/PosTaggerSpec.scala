package repro.nlp

import org.scalatest.funsuite.AnyFunSuite

/** Coarse POS tagging that feeds the corpus-selection vectors (§II-A). */
class PosTaggerSpec extends AnyFunSuite {

  private val cases = Seq(
    "1"          -> "CD",
    "1/2"        -> "CD",
    "2-4"        -> "CD",
    "500"        -> "CD",
    ","          -> "PUNCT",
    "of"         -> "IN",
    "with"       -> "IN",
    "or"         -> "CC",
    "and"        -> "CC",
    "a"          -> "DT",
    "the"        -> "DT",
    "chopped"    -> "VBD",
    "minced"     -> "VBD",
    "ground"     -> "VBD",
    "softened"   -> "VBD",
    "fresh"      -> "JJ",
    "small"      -> "JJ",
    "large"      -> "JJ",
    "cold"       -> "JJ",
    "finely"     -> "JJ",
    "butter"     -> "NN",
    "onion"      -> "NN",
    "teaspoon"   -> "NN",
    "dill"       -> "NN",
  )
  cases.foreach { case (tok, tag) =>
    test(s"'$tok' tags as $tag") { assert(PosTagger.tag(tok) == tag) }
  }

  test("tagging is case-insensitive") {
    assert(PosTagger.tag("Chopped") == "VBD")
    assert(PosTagger.tag("FRESH") == "JJ")
  }

  test("frequency vector aligns with the fixed tag set") {
    val v = PosTagger.frequencyVector(Seq("1", "small", "onion", ",", "finely", "chopped"))
    val byTag = PosTagger.TagSet.zip(v).toMap
    assert(byTag("CD") == 1.0)
    assert(byTag("JJ") == 2.0)   // small, finely
    assert(byTag("NN") == 1.0)   // onion
    assert(byTag("PUNCT") == 1.0)
    assert(byTag("VBD") == 1.0)  // chopped
    assert(v.length == PosTagger.TagSet.length)
  }

  test("frequency vector of empty phrase is all zeros") {
    assert(PosTagger.frequencyVector(Seq.empty).forall(_ == 0.0))
  }

  test("structurally different phrases get different vectors") {
    val a = PosTagger.frequencyVector("1/2 lb lean ground beef".split(" ").toSeq)
    val b = PosTagger.frequencyVector("1 small onion , finely chopped".split(" ").toSeq)
    assert(!a.sameElements(b))
  }
}
