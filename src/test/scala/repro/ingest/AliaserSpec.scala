package repro.ingest

import org.apache.spark.sql.functions.col
import org.scalatest.funsuite.AnyFunSuite

import repro.SparkSpec
import repro.flavor.FlavorGen

/** Unit tests for the ingredient-aliasing substrate (Methodology IV.A). */
class AliaserSpec extends AnyFunSuite with SparkSpec {

  private lazy val u = FlavorGen.universe()
  private lazy val dict = Aliaser.dictionary(u)

  test("dictionary contains every canonical ingredient name") {
    for (ing <- u.ingredients) {
      val key = TextNorm.normalize(ing.name).mkString(" ")
      assert(dict.get(key).contains(ing.id), s"missing '${ing.name}'")
    }
  }

  test("dictionary contains every synonym, mapped to the canonical id") {
    for ((surface, canonical) <- FlavorGen.Synonyms) {
      val key = TextNorm.normalize(surface).mkString(" ")
      assert(dict.get(key).contains(u.byName(canonical).id), s"missing synonym '$surface'")
    }
  }

  test("dictionary maps the 29 noise entities to the noise sentinel") {
    for (noise <- FlavorGen.NoiseEntities) {
      val key = TextNorm.normalize(noise).mkString(" ")
      assert(dict.get(key).contains(Aliaser.NoiseId), s"noise '$noise' not flagged")
    }
  }

  test("there are exactly 29 noise entities, as in the paper") {
    assert(FlavorGen.NoiseEntities.size == 29)
  }

  test("plain name phrase aliases to its ingredient") {
    assert(Aliaser.aliasPhrase(dict, "onion") == u.byName("onion").id)
  }

  test("decorated phrase aliases to its ingredient") {
    assert(Aliaser.aliasPhrase(dict, "2 cups finely chopped onions, to taste") ==
           u.byName("onion").id)
  }

  test("multi-token names match as n-grams") {
    assert(Aliaser.aliasPhrase(dict, "1 teaspoon coriander seed") ==
           u.byName("coriander seed").id)
  }

  test("leftmost-longest match prefers the longer name") {
    // "coriander seed" must win over bare "coriander".
    assert(Aliaser.aliasPhrase(dict, "coriander seed, toasted") ==
           u.byName("coriander seed").id)
    assert(Aliaser.aliasPhrase(dict, "fresh coriander") == u.byName("coriander").id)
  }

  test("synonym surface forms resolve to the canonical ingredient") {
    assert(Aliaser.aliasPhrase(dict, "1 bun") == u.byName("bread").id)
    assert(Aliaser.aliasPhrase(dict, "a pint of lager") == u.byName("beer").id)
    assert(Aliaser.aliasPhrase(dict, "2 cups curd") == u.byName("yogurt").id)
    assert(Aliaser.aliasPhrase(dict, "whisky") == u.byName("whiskey").id)
    assert(Aliaser.aliasPhrase(dict, "hing") == u.byName("asafoetida").id)
    assert(Aliaser.aliasPhrase(dict, "3 chiles") == u.byName("chili").id)
  }

  test("plural surface forms resolve via singularization") {
    assert(Aliaser.aliasPhrase(dict, "4 tomatoes") == u.byName("tomato").id)
    assert(Aliaser.aliasPhrase(dict, "strawberries") == u.byName("strawberry").id)
  }

  test("noise phrases return the noise sentinel") {
    assert(Aliaser.aliasPhrase(dict, "a garnish") == Aliaser.NoiseId)
    assert(Aliaser.aliasPhrase(dict, "2 cups mixture") == Aliaser.NoiseId)
  }

  test("unknown phrases return the unmatched sentinel") {
    assert(Aliaser.aliasPhrase(dict, "unobtanium shavings") == Aliaser.UnmatchedId)
    assert(Aliaser.aliasPhrase(dict, "") == Aliaser.UnmatchedId)
    assert(Aliaser.aliasPhrase(dict, "2 cups of") == Aliaser.UnmatchedId)
  }

  test("n-grams longer than MaxNgram are not required") {
    // Even with >6 leading junk tokens the scan window still finds the name.
    val phrase = "zzz yyy xxx www vvv uuu ttt sss onion"
    assert(Aliaser.aliasPhrase(dict, phrase) == u.byName("onion").id)
  }

  test("empty-profile additives are still aliasable") {
    for (name <- FlavorGen.ProfileFreeAdditives)
      assert(Aliaser.aliasPhrase(dict, name) == u.byName(name).id, s"additive '$name'")
  }

  test("Spark alias transform matches driver-side aliasing") {
    import spark.implicits._
    val phrases = Seq(
      ("X", 1L, 0, "2 cups chopped onions"),
      ("X", 1L, 1, "1 bun"),
      ("X", 2L, 0, "garnish"),
      ("X", 2L, 1, "unobtanium shavings"),
    ).toDF("region", "recipe_id", "slot", "phrase")
    val out = Aliaser.alias(spark, u, phrases)
      .select("slot", "recipe_id", "ing_id").collect()
      .map(r => (r.getLong(1), r.getInt(0)) -> r.getInt(2)).toMap
    assert(out((1L, 0)) == u.byName("onion").id)
    assert(out((1L, 1)) == u.byName("bread").id)
    assert(out((2L, 0)) == Aliaser.NoiseId)
    assert(out((2L, 1)) == Aliaser.UnmatchedId)
  }

  test("aliasedRecipes keeps only matched rows") {
    import spark.implicits._
    val phrases = Seq(
      ("X", 1L, 0, "onion"),
      ("X", 1L, 1, "garnish"),
      ("X", 1L, 2, "unobtanium"),
    ).toDF("region", "recipe_id", "slot", "phrase")
    val out = Aliaser.aliasedRecipes(spark, u, phrases)
    assert(out.count() == 1)
    assert(out.filter(col("ing_id") === u.byName("onion").id).count() == 1)
  }
}
