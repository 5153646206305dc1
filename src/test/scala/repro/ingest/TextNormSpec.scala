package repro.ingest

import org.scalatest.funsuite.AnyFunSuite

import repro.flavor.FlavorGen

/** Unit tests for the NLP normalization substrate (Methodology IV.A). */
class TextNormSpec extends AnyFunSuite {

  // ── tokenization ──────────────────────────────────────────────────────

  test("normalize lowercases") {
    assert(TextNorm.normalize("Jalapeno PEPPER") == Vector("jalapeno", "pepper"))
  }

  test("normalize strips punctuation and special characters") {
    assert(TextNorm.normalize("tomato, (vine-ripened)!") == Vector("tomato", "vine", "ripened"))
  }

  test("normalize drops numeric tokens and fractions") {
    assert(TextNorm.normalize("2 1/2 onion") == Vector("onion"))
  }

  test("normalize drops mixed alphanumeric digits") {
    assert(TextNorm.normalize("350g butter") == Vector("butter"))
  }

  test("normalize of empty string is empty") {
    assert(TextNorm.normalize("") == Vector.empty)
  }

  test("normalize of only stopwords is empty") {
    assert(TextNorm.normalize("2 cups of finely chopped fresh") == Vector.empty)
  }

  // ── stopwords ─────────────────────────────────────────────────────────

  test("english stopwords are removed") {
    assert(TextNorm.normalize("a pinch of the salt") == Vector("salt"))
  }

  test("culinary units are removed") {
    assert(TextNorm.normalize("3 tablespoons olive oil") == Vector("olive", "oil"))
  }

  test("preparation verbs are removed") {
    assert(TextNorm.normalize("garlic, peeled and crushed") == Vector("garlic"))
  }

  test("descriptors are removed") {
    assert(TextNorm.normalize("1 large ripe tomato") == Vector("tomato"))
  }

  test("the paper's example phrase normalizes to the ingredient") {
    assert(TextNorm.normalize("2 jalapeno peppers, roasted and slit") ==
           Vector("jalapeno", "pepper"))
  }

  test("stopword sets are disjoint from ingredient-name tokens") {
    val u = FlavorGen.universe()
    val nameTokens = u.ingredients.flatMap(_.name.split(' ')).toSet
    val overlap = nameTokens.intersect(TextNorm.AllStopwords)
    assert(overlap.isEmpty, s"name tokens shadowed by stopwords: $overlap")
  }

  // ── singularize ───────────────────────────────────────────────────────

  test("singularize plain plural") { assert(TextNorm.singularize("onions") == "onion") }
  test("singularize -ies") { assert(TextNorm.singularize("berries") == "berry") }
  test("singularize -oes") { assert(TextNorm.singularize("tomatoes") == "tomato") }
  test("singularize -xes") { assert(TextNorm.singularize("boxes") == "box") }
  test("singularize -ches") { assert(TextNorm.singularize("peaches") == "peach") }
  test("singularize -shes") { assert(TextNorm.singularize("radishes") == "radish") }
  test("singularize -sses") { assert(TextNorm.singularize("glasses") == "glass") }
  test("singularize keeps -ss words") { assert(TextNorm.singularize("glass") == "glass") }
  test("singularize irregular leaves") { assert(TextNorm.singularize("leaves") == "leaf") }
  test("singularize irregular halves") { assert(TextNorm.singularize("halves") == "half") }
  test("singularize keeps molasses") { assert(TextNorm.singularize("molasses") == "molasses") }
  test("singularize keeps asparagus") { assert(TextNorm.singularize("asparagus") == "asparagus") }
  test("singularize keeps hummus") { assert(TextNorm.singularize("hummus") == "hummus") }
  test("singularize keeps short words") { assert(TextNorm.singularize("as") == "as") }
  test("singularize keeps singular words") { assert(TextNorm.singularize("onion") == "onion") }

  // ── pluralize ─────────────────────────────────────────────────────────

  test("pluralize plain") { assert(TextNorm.pluralize("onion") == "onions") }
  test("pluralize consonant-y") { assert(TextNorm.pluralize("cherry") == "cherries") }
  test("pluralize vowel-y") { assert(TextNorm.pluralize("whiskey") == "whiskeys") }
  test("pluralize consonant-o") { assert(TextNorm.pluralize("potato") == "potatoes") }
  test("pluralize -sh") { assert(TextNorm.pluralize("radish") == "radishes") }
  test("pluralize -x") { assert(TextNorm.pluralize("box") == "boxes") }
  test("pluralize irregular half") { assert(TextNorm.pluralize("half") == "halves") }
  test("pluralize keeps words already ending in s") {
    assert(TextNorm.pluralize("molasses") == "molasses")
  }

  test("singularize inverts pluralize on every ingredient-name token") {
    val u = FlavorGen.universe()
    for (tok <- u.ingredients.flatMap(_.name.split(' ')).distinct) {
      assert(TextNorm.singularize(TextNorm.pluralize(tok)) == TextNorm.singularize(tok),
             s"round trip broken for '$tok'")
    }
  }

  test("singularize is idempotent on ingredient-name tokens") {
    val u = FlavorGen.universe()
    for (tok <- u.ingredients.flatMap(_.name.split(' ')).distinct) {
      val s = TextNorm.singularize(tok)
      assert(TextNorm.singularize(s) == s, s"not idempotent for '$tok'")
    }
  }

  test("normalize singularizes every token") {
    assert(TextNorm.normalize("tomatoes and berries") == Vector("tomato", "berry"))
  }
}
