package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** Post-processing of tag sequences into Table I's structured columns. */
class NerExtractSpec extends AnyFunSuite {

  test("tokenize splits commas into their own tokens") {
    assert(NerPipeline.tokenize("1 small onion, finely chopped") ==
      IndexedSeq("1", "small", "onion", ",", "finely", "chopped"))
    assert(NerPipeline.tokenize("1/2 teaspoon salt ,freshly ground") ==
      IndexedSeq("1/2", "teaspoon", "salt", ",", "freshly", "ground"))
  }

  test("basic extraction: '1/2 lb lean ground beef'") {
    val toks = IndexedSeq("1/2", "lb", "lean", "ground", "beef")
    val tags = IndexedSeq("QUANTITY", "UNIT", "STATE", "STATE", "NAME")
    val e = NerPipeline.extract(toks, tags)
    assert(e.name == "beef")
    assert(e.state == "lean ground")
    assert(e.quantity == "1/2")
    assert(e.unit == "lb")
    assert(e.size == "" && e.temp == "" && e.df == "")
  }

  test("size extraction: '1 small onion , finely chopped'") {
    val toks = IndexedSeq("1", "small", "onion", ",", "finely", "chopped")
    val tags = IndexedSeq("QUANTITY", "SIZE", "NAME", "O", "O", "STATE")
    val e = NerPipeline.extract(toks, tags)
    assert(e.name == "onion")
    assert(e.size == "small")
    assert(e.state == "chopped")
    assert(e.unit == "")
  }

  test("temp extraction: '1 tablespoon cold water'") {
    val e = NerPipeline.extract(
      IndexedSeq("1", "tablespoon", "cold", "water"),
      IndexedSeq("QUANTITY", "UNIT", "TEMP", "NAME"))
    assert(e.name == "water" && e.temp == "cold" && e.unit == "tablespoon")
  }

  test("dry/fresh extraction: '1 tablespoon fresh dill weed'") {
    val e = NerPipeline.extract(
      IndexedSeq("1", "tablespoon", "fresh", "dill", "weed"),
      IndexedSeq("QUANTITY", "UNIT", "DF", "NAME", "NAME"))
    assert(e.name == "dill weed" && e.df == "fresh")
  }

  test("multi-token quantity: '2 1/2 cups flour'") {
    val e = NerPipeline.extract(
      IndexedSeq("2", "1/2", "cups", "flour"),
      IndexedSeq("QUANTITY", "QUANTITY", "UNIT", "NAME"))
    assert(e.quantity == "2 1/2")
  }

  test("'or' alternative keeps only the first segment (Table I butter row)") {
    val toks = IndexedSeq("3/4", "cup", "butter", "or", "3/4", "cup", "margarine")
    val tags = IndexedSeq("QUANTITY", "UNIT", "NAME", "O", "QUANTITY", "UNIT", "NAME")
    val e = NerPipeline.extract(toks, tags)
    assert(e.name == "butter")
    assert(e.quantity == "3/4")
    assert(e.unit == "cup")
  }

  test("'or' inside a name does not truncate") {
    val toks = IndexedSeq("1", "cup", "cream", "or", "milk")
    val tags = IndexedSeq("QUANTITY", "UNIT", "NAME", "O", "NAME")
    // next token after 'or' is not QUANTITY → no truncation
    assert(NerPipeline.extract(toks, tags).name == "cream milk")
  }

  test("missed unit is recovered from the phrase (§II-C fallback)") {
    val toks = IndexedSeq("2", "tbsp", "sugar")
    val tags = IndexedSeq("QUANTITY", "O", "NAME") // NER missed the unit
    assert(NerPipeline.extract(toks, tags).unit == "tbsp")
  }

  test("unit recovery never steals NAME or SIZE tokens") {
    val toks = IndexedSeq("1", "small", "can")
    val tags = IndexedSeq("QUANTITY", "SIZE", "NAME") // 'can' is the food name here
    assert(NerPipeline.extract(toks, tags).unit == "")
  }

  test("empty tags produce empty extraction fields") {
    val e = NerPipeline.extract(IndexedSeq("mystery"), IndexedSeq("O"))
    assert(e.name == "" && e.quantity == "" && e.unit == "")
  }

  test("length mismatch is rejected") {
    intercept[IllegalArgumentException] {
      NerPipeline.extract(IndexedSeq("a", "b"), IndexedSeq("O"))
    }
  }
}
