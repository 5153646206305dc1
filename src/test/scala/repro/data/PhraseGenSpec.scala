package repro.data

import org.scalatest.funsuite.AnyFunSuite

import repro.flavor.FlavorGen
import repro.ingest.{Aliaser, TextNorm}

/** Phrase synthesis must be deterministic and exactly invertible by the
  * aliasing pipeline — that invertibility is what makes the end-to-end
  * reproduction a real test of the ingestion substrate.
  */
class PhraseGenSpec extends AnyFunSuite {

  private lazy val u = FlavorGen.universe()
  private lazy val dict = Aliaser.dictionary(u)

  test("phrase generation is deterministic") {
    val a = PhraseGen.phrase(u, 42L, 0, 10)
    val b = PhraseGen.phrase(u, 42L, 0, 10)
    assert(a == b)
  }

  test("different slots give different decorations eventually") {
    val ps = (0 until 20).map(s => PhraseGen.phrase(u, 42L, s, 10))
    assert(ps.distinct.size > 1)
  }

  test("every phrase aliases back to its ground-truth ingredient") {
    val rng = new scala.util.Random(5)
    for (_ <- 1 to 2000) {
      val ing = rng.nextInt(u.size)
      val rid = rng.nextLong(1000000L)
      val slot = rng.nextInt(12)
      val p = PhraseGen.phrase(u, rid, slot, ing)
      assert(Aliaser.aliasPhrase(dict, p) == ing,
             s"phrase '$p' aliased to ${Aliaser.aliasPhrase(dict, p)}, expected $ing (${u.byId(ing).name})")
    }
  }

  test("all 943 ingredients round-trip under many decoration draws") {
    // Exhaustive over ingredients × 8 deterministic decoration variants —
    // guarantees no name is unreachable through the aliasing pipeline.
    for (ing <- u.ingredients; rid <- 0L until 8L) {
      val p = PhraseGen.phrase(u, rid, (rid % 3).toInt, ing.id)
      assert(Aliaser.aliasPhrase(dict, p) == ing.id, s"'${ing.name}' via '$p'")
    }
  }

  test("synonym surfaces appear in generated phrases") {
    // bread has synonym 'bun' used with probability 0.3.
    val bread = u.byName("bread").id
    val surfaced = (0 until 200).map(i => PhraseGen.phrase(u, i.toLong, 0, bread))
    assert(surfaced.exists(_.contains("bun")), "no synonym surface in 200 draws")
    assert(surfaced.exists(_.contains("bread")), "no canonical surface in 200 draws")
  }

  test("plural surfaces appear in generated phrases") {
    val tomato = u.byName("tomato").id
    val surfaced = (0 until 100).map(i => PhraseGen.phrase(u, i.toLong, 1, tomato))
    assert(surfaced.exists(_.contains("tomatoes")))
  }

  test("decorations are drawn only from stopwords and numerals") {
    val rng = new scala.util.Random(6)
    for (_ <- 1 to 500) {
      val ing = rng.nextInt(u.size)
      val p = PhraseGen.phrase(u, rng.nextLong(1000L), rng.nextInt(5), ing)
      val tokens = TextNorm.normalize(p)
      val nameTokens = TextNorm.normalize(u.byId(ing).name).toSet ++
        PhraseGen.SurfaceSynonyms.getOrElse(u.byId(ing).name, Vector.empty)
          .flatMap(TextNorm.normalize)
      assert(tokens.forall(nameTokens), s"leftover decoration tokens in '$p': " +
        tokens.filterNot(nameTokens))
    }
  }

  test("phrases for a whole recipe preserve slot order") {
    val row = RecipeRow("ITA", 123L, Vector(1, 5, 9))
    val ps = PhraseGen.phrases(u, row)
    assert(ps.map(_._1) == Vector(0, 1, 2))
  }
}
