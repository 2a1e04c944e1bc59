package repro.nlp

import org.scalatest.funsuite.AnyFunSuite

/** Feature templates for the sequence tagger. */
class NerFeaturesSpec extends AnyFunSuite {

  private def feats(sent: String, i: Int): Set[String] =
    NerFeatures.featuresAt(sent.split(" ").toIndexedSeq, i).toSet

  test("every position gets a bias feature") {
    assert(feats("1 cup flour", 0).contains("bias"))
    assert(feats("1 cup flour", 2).contains("bias"))
  }

  test("numeric tokens get isNum") {
    assert(feats("1/2 cup flour", 0).contains("isNum"))
    assert(feats("2-4 eggs", 0).contains("isNum"))
    assert(!feats("one cup flour", 0).contains("isNum"))
  }

  test("word shape distinguishes fractions from words") {
    assert(feats("1/2 cup", 0).contains("shape=d/d"))
    assert(feats("1/2 cup", 1).contains("shape=xxx"))
  }

  test("unit lexicon membership fires for aliases and full names") {
    assert(feats("1 tbsp salt", 1).contains("inUnitLex"))
    assert(feats("1 tablespoon salt", 1).contains("inUnitLex"))
    assert(feats("1 cups salt", 1).contains("inUnitLex"))
    assert(!feats("1 tbsp salt", 2).contains("inUnitLex"))
  }

  test("size/temp/df/state lexicons fire") {
    assert(feats("1 small onion", 1).contains("inSizeLex"))
    assert(feats("1 cup cold water", 2).contains("inTempLex"))
    assert(feats("1 cup fresh dill", 2).contains("inDFLex"))
    assert(feats("1 onion chopped", 2).contains("inStateLex"))
  }

  test("neighbour features look left and right with sentence boundaries") {
    val f0 = feats("1 cup flour", 0)
    assert(f0.contains("prev=<s>"))
    assert(f0.contains("next=cup"))
    val f2 = feats("1 cup flour", 2)
    assert(f2.contains("next=</s>"))
    assert(f2.contains("prev=cup"))
  }

  test("first/last position markers") {
    assert(feats("1 cup flour", 0).contains("first"))
    assert(feats("1 cup flour", 2).contains("last"))
    assert(!feats("1 cup flour", 1).contains("first"))
  }

  test("hyphenated tokens are marked") {
    assert(feats("1 hard-cooked egg", 1).contains("hyphen"))
  }

  test("features are case-normalized") {
    assert(feats("1 Cup Flour", 1).contains("w=cup"))
  }

  test("tag inventory covers the paper's seven entity types plus O") {
    assert(NerFeatures.Tags.toSet ==
      Set("NAME", "STATE", "QUANTITY", "UNIT", "TEMP", "DF", "SIZE", "O"))
  }
}
