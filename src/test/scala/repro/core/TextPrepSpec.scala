package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** §II-B preprocessing: casing, stop words, lemmas, negation, priorities. */
class TextPrepSpec extends AnyFunSuite {

  test("ingredient prep lowercases, lemmatizes and dedups") {
    assert(TextPrep.prepIngredient("Red Lentils") == Set("red", "lentil"))
    assert(TextPrep.prepIngredient("sesame seeds") == Set("sesame", "seed"))
    assert(TextPrep.prepIngredient("egg egg") == Set("egg"))
  }

  test("ingredient prep joins name with state, temp and freshness (heuristic d)") {
    assert(TextPrep.prepIngredient("beef", "lean ground") == Set("beef", "lean", "ground"))
    assert(TextPrep.prepIngredient("water", "", "cold") == Set("water", "cold"))
    assert(TextPrep.prepIngredient("dill weed", "", "", "fresh") == Set("dill", "weed", "fresh"))
  }

  test("stop words are removed") {
    assert(TextPrep.prepIngredient("cream of tartar") == Set("cream", "tartar"))
    assert(!TextPrep.prepDescription("Cheese, cottage, creamed, large or small curd")
      .exists(_.token == "or"))
    assert(!TextPrep.prepDescription("Apples, raw, with skin").exists(_.token == "with"))
  }

  test("negation: 'unsalted' becomes {not, salt} (heuristic f)") {
    assert(TextPrep.prepIngredient("unsalted butter") == Set("not", "salt", "butter"))
  }

  test("negation: 'without salt' becomes {not, salt}") {
    val toks = TextPrep.prepDescription("Butter, without salt").map(_.token).toSet
    assert(toks == Set("butter", "not", "salt"))
  }

  test("negation: perfect Jaccard between 'unsalted butter' and 'Butter, without salt'") {
    val a = TextPrep.prepIngredient("unsalted butter")
    val b = TextPrep.prepDescription("Butter, without salt").map(_.token).toSet
    assert(a == b) // paper's worked example of (f)
  }

  test("negation: 'uncooked' becomes {not, cook…}") {
    val toks = TextPrep.prepIngredient("uncooked rice")
    assert(toks.contains("not") && toks.contains("rice"))
  }

  test("'un' words that are not participles are untouched") {
    assert(TextPrep.prepIngredient("onion union") == Set("onion", "union"))
  }

  test("description priorities follow comma groups (heuristic a)") {
    val pts = TextPrep.prepDescription("Butter, whipped, with salt")
    val m   = pts.map(pt => pt.token -> pt.priority).toMap
    assert(m("butter") == 0)
    assert(m("whipped") == 1)
    assert(m("salt") == 2)
  }

  test("repeated token keeps its smallest priority") {
    val pts = TextPrep.prepDescription("Egg, egg white, egg yolk")
    assert(pts.find(_.token == "egg").get.priority == 0)
  }

  test("parenthetical synonyms are kept as tokens") {
    val toks = TextPrep.prepDescription("Coriander (cilantro) leaves, raw").map(_.token).toSet
    assert(toks.contains("coriander") && toks.contains("cilantro") && toks.contains("leaf"))
  }

  test("verbose milk description tokenizes fully (Table II rows 7-9)") {
    val toks = TextPrep
      .prepDescription("Milk, reduced fat, fluid, 2% milkfat, protein fortified, with added vitamin A and vitamin D")
      .map(_.token).toSet
    assert(toks.contains("milk") && toks.contains("milkfat") && toks.contains("fortified"))
    assert(!toks.contains("and") && !toks.contains("with"))
  }

  test("descriptionHasRaw detects the literal token only") {
    assert(TextPrep.descriptionHasRaw("Apples, raw, with skin"))
    assert(TextPrep.descriptionHasRaw("Egg, whole, raw, fresh"))
    assert(!TextPrep.descriptionHasRaw("Salad dressing, sesame seed dressing, regular"))
    assert(!TextPrep.descriptionHasRaw("Strawberries, frozen")) // 'raw' inside a word
  }

  test("plural description heads lemmatize to match singular ingredients (b)") {
    val apples = TextPrep.prepDescription("Apples, raw, with skin").map(_.token).toSet
    assert(apples.contains("apple"))
    val a = TextPrep.prepIngredient("apple")
    assert((a intersect apples).nonEmpty)
  }

  test("empty and null-ish input yields empty sets") {
    assert(TextPrep.prepIngredient("") == Set.empty[String])
    assert(TextPrep.prepIngredient("", "", "", "") == Set.empty[String])
    assert(TextPrep.prepDescription("").isEmpty)
  }

  test("hyphenated ingredient words split into parts") {
    val toks = TextPrep.prepIngredient("all-purpose flour")
    assert(toks == Set("all", "purpose", "flour"))
  }

  test("prep output tokens are never empty strings") {
    val all = TextPrep.prepIngredient("1/2  lb,, lean -- beef") ++
      TextPrep.prepDescription("Beef, ground, 85% lean meat / 15% fat, raw").map(_.token)
    assert(all.forall(_.nonEmpty))
  }
}
