package repro.nlp

import org.scalatest.funsuite.AnyFunSuite
import repro.nlp.NerTrainer.Labeled

/** Averaged-perceptron training on a tiny hand-labeled corpus (§II-A). */
class NerTrainerSpec extends AnyFunSuite {

  private def lab(phrase: String, tags: String): Labeled =
    Labeled(phrase.split(" ").toIndexedSeq, tags.split(" ").toIndexedSeq)

  // A miniature version of the paper's manually tagged corpus.
  private val corpus = Seq(
    lab("1/2 lb lean ground beef",            "QUANTITY UNIT STATE STATE NAME"),
    lab("1 small onion , finely chopped",     "QUANTITY SIZE NAME O O STATE"),
    lab("1 tablespoon fresh dill weed",       "QUANTITY UNIT DF NAME NAME"),
    lab("1/2 teaspoon salt",                  "QUANTITY UNIT NAME"),
    lab("1/8 teaspoon black pepper",          "QUANTITY UNIT NAME NAME"),
    lab("3/4 cup butter , softened",          "QUANTITY UNIT NAME O STATE"),
    lab("2 cups all-purpose flour",           "QUANTITY UNIT NAME NAME"),
    lab("1 teaspoon salt",                    "QUANTITY UNIT NAME"),
    lab("1/2 cup sour cream",                 "QUANTITY UNIT STATE NAME"),
    lab("1 egg yolk",                         "QUANTITY NAME NAME"),
    lab("1 tablespoon cold water",            "QUANTITY UNIT TEMP NAME"),
    lab("2 tablespoons sesame seeds",         "QUANTITY UNIT NAME NAME"),
    lab("1 cup red lentils",                  "QUANTITY UNIT NAME NAME"),
    lab("2 tbsp tomato paste",                "QUANTITY UNIT NAME NAME"),
    lab("1 large egg , beaten",               "QUANTITY SIZE NAME O STATE"),
    lab("3 cloves garlic , minced",           "QUANTITY UNIT NAME O STATE"),
    lab("1 cup milk",                         "QUANTITY UNIT NAME"),
    lab("2 medium carrots , sliced",          "QUANTITY SIZE NAME O STATE"),
    lab("1 pound chicken",                    "QUANTITY UNIT NAME"),
    lab("1/4 cup olive oil",                  "QUANTITY UNIT NAME NAME"),
    lab("1 teaspoon dried oregano",           "QUANTITY UNIT DF NAME"),
    lab("2 cups hot water",                   "QUANTITY UNIT TEMP NAME"),
  )

  private lazy val model = NerTrainer.train(corpus, epochs = 12, seed = 1)

  test("training reproduces the training set (separable corpus)") {
    val score = NerTrainer.evaluate(model, corpus)
    assert(score.f1 > 0.97, s"train F1 ${score.f1}")
  }

  test("generalizes to unseen but structurally similar phrases") {
    assert(model.tag(IndexedSeq("2", "cups", "milk")) ==
      Vector("QUANTITY", "UNIT", "NAME"))
    assert(model.tag(IndexedSeq("1", "small", "carrot", ",", "finely", "sliced")) ==
      Vector("QUANTITY", "SIZE", "NAME", "O", "O", "STATE"))
    assert(model.tag(IndexedSeq("1", "tablespoon", "cold", "milk")) ==
      Vector("QUANTITY", "UNIT", "TEMP", "NAME"))
  }

  test("unit aliases are tagged as units via the lexicon feature") {
    assert(model.tag(IndexedSeq("2", "tbsp", "sugar"))(1) == "UNIT")
    assert(model.tag(IndexedSeq("2", "tsp", "sugar"))(1) == "UNIT")
  }

  test("training is deterministic in the seed") {
    val m1 = NerTrainer.train(corpus, epochs = 4, seed = 5)
    val m2 = NerTrainer.train(corpus, epochs = 4, seed = 5)
    val probe = IndexedSeq("1", "cup", "fresh", "basil")
    assert(m1.tag(probe) == m2.tag(probe))
  }

  test("evaluate: perfect predictions give F1 = 1 on non-O tokens") {
    val perfect = NerTrainer.evaluate(model, Seq(corpus.head))
    assert(perfect.f1 >= 0.99)
  }

  test("evaluate: per-tag F1 is reported for every entity type present") {
    val score = NerTrainer.evaluate(model, corpus)
    assert(score.perTag.keySet.contains("NAME"))
    assert(score.perTag("NAME") > 0.9)
    assert(score.perTag("QUANTITY") > 0.9)
  }

  test("cross-validation returns one F1 per fold") {
    val f1s = NerTrainer.crossValidate(corpus, folds = 3, epochs = 6, seed = 2)
    assert(f1s.length == 3)
    assert(f1s.forall(f => f >= 0.0 && f <= 1.0))
  }

  test("empty-ish evaluation degrades to zero, not NaN") {
    val allO = Seq(Labeled(IndexedSeq("xyzzy"), IndexedSeq("O")))
    val s = NerTrainer.evaluate(model, allO)
    assert(!s.f1.isNaN && s.f1 >= 0.0)
  }
}
