package repro.data

import repro.SparkSpec
import repro.core.UnitTables

/** Shape and integrity of the synthetic USDA-SR reference database. */
class UsdaDataSpec extends SparkSpec {

  test("curated seed contains every Table II description") {
    val descs = UsdaData.curatedFoods.map(_.description).toSet
    val tableII = Seq(
      "Butter, salted",
      "Butter, whipped, with salt",
      "Butter, without salt",
      "Cheese, blue",
      "Cheese, cottage, creamed, large or small curd",
      "Cheese, mozzarella, whole milk",
      "Milk, reduced fat, fluid, 2% milkfat, with added vitamin A and vitamin D",
      "Milk, indian buffalo, fluid",
      "Milk shakes, thick chocolate",
      "Milk shakes, thick vanilla",
      "Yogurt, plain, whole milk, 8 grams protein per 8 ounce",
      "Egg, whole, raw, fresh",
      "Egg, white, raw, fresh",
      "Egg, yolk, raw, fresh",
      "Apples, raw, with skin",
      "Apples, raw, without skin",
    )
    tableII.foreach(d => assert(descs.contains(d), s"missing: $d"))
  }

  test("curated seed contains every Table III target description") {
    val descs = UsdaData.curatedFoods.map(_.description).toSet
    val tableIII = Seq(
      "Lentils, pink or red, raw",
      "Cherries, sour, red, raw",
      "Soup, tomato beef with noodle, canned, condensed",
      "Soup, tomato, canned, condensed",
      "Coriander (cilantro) leaves, raw",
      "Spices, coriander leaf, dried",
      "Tomato products, canned, paste, without salt added",
      "Soup, vegetable with beef broth, canned, condensed",
      "Soup, vegetable broth, ready to serve",
      "Broadbeans (fava beans), mature seeds, raw",
      "Beans, fava, in pod, raw",
      "Spices, pepper, red or cayenne",
      "Spices, pepper, black",
      "Chicken, broilers or fryers, meat and skin and giblets and neck, raw",
      "Fast foods, quesadilla, with chicken",
      "Salad dressing, sesame seed dressing, regular",
      "Seeds, sesame seeds, whole, dried",
    )
    tableIII.foreach(d => assert(descs.contains(d), s"missing: $d"))
  }

  test("Table IV rows for Butter,salted are reproduced verbatim") {
    val butterWeights = UsdaData.curatedWeights.filter(_.ndbId == 1).sortBy(_.seq)
    assert(butterWeights.map(w => (w.seq, w.amount, UnitTables.standardize(w.unit), w.grams)) == Seq(
      (1, 1.0, "pat", 5.0),
      (2, 1.0, "tablespoon", 14.2),
      (3, 1.0, "cup", 227.0),
      (4, 1.0, "stick", 113.0),
    ))
  }

  test("ndbIds are unique across curated and expanded foods") {
    val ids = UsdaData.allFoods.map(_.ndbId)
    assert(ids.distinct.length == ids.length)
  }

  test("every weight row references an existing food") {
    val ids = UsdaData.allFoods.map(_.ndbId).toSet
    assert(UsdaData.allWeights.forall(w => ids.contains(w.ndbId)))
  }

  test("every alias references an existing food") {
    val ids = UsdaData.allFoods.map(_.ndbId).toSet
    assert(UsdaData.allAliases.forall(a => ids.contains(a.ndbId)))
  }

  test("expansion recreates USDA-scale collision density (>1k foods)") {
    assert(UsdaData.allFoods.size > 1000, s"got ${UsdaData.allFoods.size}")
  }

  test("expansion is deterministic") {
    assert(UsdaData.expandedFoods == UsdaData.expandedFoods)
    val again = UsdaData.expandedFoods.map(_.description)
    assert(again == UsdaData.expandedFoods.map(_.description))
  }

  test("nutrient values are in plausible ranges") {
    UsdaData.allFoods.foreach { f =>
      assert(f.kcal100g >= 0 && f.kcal100g < 950, s"${f.description}: ${f.kcal100g}")
      assert(f.protein100g >= 0 && f.fat100g >= 0 && f.carb100g >= 0)
    }
  }

  test("every expanded food has at least one gram-weight row") {
    val withWeights = UsdaData.allWeights.map(_.ndbId).toSet
    val missing = UsdaData.expandedFoods.filterNot(f => withWeights.contains(f.ndbId))
    assert(missing.isEmpty, s"foods without weights: ${missing.take(3).map(_.description)}")
  }

  test("gram weights are positive and below the plausibility threshold") {
    UsdaData.allWeights.foreach { w =>
      assert(w.grams > 0 && w.grams < 5000 && w.amount > 0)
    }
  }

  test("unmappable names share no head noun with any description") {
    // They must stay unmapped — this bounds the match rate like the paper's
    // region-centric ingredients do.
    val descTokens = UsdaData.allFoods
      .flatMap(f => repro.core.TextPrep.prepDescription(f.description).map(_.token)).toSet
    UsdaData.unmappableNames.foreach { n =>
      val toks = repro.core.TextPrep.prepIngredient(n)
      assert((toks intersect descTokens).isEmpty, s"'$n' collides: ${toks intersect descTokens}")
    }
  }

  test("DataFrames expose the expected schemas") {
    val foods = UsdaData.foods(spark)
    assert(foods.columns.toSet == Set("ndbId", "description", "kcal100g",
      "protein100g", "fat100g", "carb100g"))
    assert(foods.count() == UsdaData.allFoods.size.toLong)
    val weights = UsdaData.weights(spark)
    assert(weights.columns.toSet == Set("ndbId", "seq", "amount", "unit", "grams"))
    assert(weights.count() == UsdaData.allWeights.size.toLong)
  }
}
