package repro.flavor

import org.scalatest.funsuite.AnyFunSuite

/** Unit tests for the FlavorDB-lite generator (Materials III.B–C). */
class FlavorGenSpec extends AnyFunSuite {

  private lazy val u = FlavorGen.universe()

  test("universe has exactly 840 basic ingredients") {
    assert(u.ingredients.count(!_.isCompound) == FlavorGen.NumBasic)
  }

  test("universe has exactly 103 compound ingredients") {
    assert(u.ingredients.count(_.isCompound) == FlavorGen.NumCompound)
  }

  test("universe has 943 ingredients in total") {
    assert(u.size == 943)
  }

  test("ids are dense and positional") {
    assert(u.ingredients.zipWithIndex.forall { case (ing, i) => ing.id == i })
  }

  test("names are unique") {
    assert(u.ingredients.map(_.name).distinct.size == u.size)
  }

  test("every category is one of the paper's 21") {
    val cats = FlavorGen.Categories.toSet
    assert(FlavorGen.Categories.size == 21)
    assert(u.ingredients.forall(i => cats(i.category)))
  }

  test("the 13 paper-added ingredients exist with their categories") {
    for ((name, cat) <- FlavorGen.AddedIngredients) {
      val ing = u.byName.get(name)
      assert(ing.isDefined, s"missing '$name'")
      assert(ing.get.category == cat)
      assert(!ing.get.isCompound)
    }
  }

  test("the 4 Ahn et al. ingredients exist") {
    for ((name, _) <- FlavorGen.AhnIngredients) assert(u.byName.contains(name))
  }

  test("the 7 additives exist in the Additive category") {
    assert(FlavorGen.Additives.size == 7)
    for (name <- FlavorGen.Additives) {
      assert(u.byName(name).category == "Additive", s"'$name'")
    }
  }

  test("exactly the last 4 additives have empty flavor profiles") {
    for (name <- FlavorGen.Additives) {
      val expectEmpty = FlavorGen.ProfileFreeAdditives(name)
      assert(u.byName(name).profile.isEmpty == expectEmpty, s"'$name'")
    }
  }

  test("non-additive basic profiles are non-empty and within molecule range") {
    for (ing <- u.ingredients if !ing.isCompound && !FlavorGen.ProfileFreeAdditives(ing.name)) {
      assert(ing.profile.nonEmpty, s"'${ing.name}' has empty profile")
      assert(ing.profile.forall(m => m >= 0 && m < FlavorGen.NumMolecules))
    }
  }

  test("compound profiles are the pooled union of constituent profiles") {
    for (c <- u.ingredients if c.isCompound) {
      val expected = c.constituents.flatMap(u.byId(_).profile).toSet
      assert(c.profile == expected, s"'${c.name}'")
    }
  }

  test("compound constituents are basic ingredients") {
    for (c <- u.ingredients if c.isCompound; k <- c.constituents)
      assert(!u.byId(k).isCompound)
  }

  test("basic ingredients have no constituents") {
    assert(u.ingredients.filter(!_.isCompound).forall(_.constituents.isEmpty))
  }

  test("the paper's compound examples exist: half half = milk + cream") {
    val hh = u.byName("half half")
    assert(hh.isCompound)
    assert(hh.constituents.map(u.byId(_).name).toSet == Set("milk", "cream"))
  }

  test("mayonnaise = oil + egg + lemon juice") {
    val mayo = u.byName("mayonnaise")
    assert(mayo.constituents.map(u.byId(_).name).toSet == Set("oil", "egg", "lemon juice"))
  }

  test("generation is deterministic for a fixed seed") {
    val u2 = FlavorGen.universe()
    assert(u2.ingredients == u.ingredients)
  }

  test("different seeds give different universes") {
    val u2 = FlavorGen.universe(seed = 43L)
    assert(u2.ingredients != u.ingredients)
  }

  test("both flavor classes are well represented") {
    val core = u.ingredients.count(_.isCore)
    assert(core > u.size / 4 && core < 3 * u.size / 4)
  }

  test("core-core pairs share more molecules than idio-idio pairs on average") {
    val basics = u.ingredients.filter(i => !i.isCompound && i.profile.nonEmpty)
    val core = basics.filter(_.isCore).take(80)
    val idio = basics.filterNot(_.isCore).take(80)
    def meanOverlap(xs: Vector[IngredientDef]): Double = {
      val ps = for (i <- xs.indices; j <- i + 1 until xs.size)
        yield (xs(i).profile intersect xs(j).profile).size.toDouble
      ps.sum / ps.size
    }
    val cc = meanOverlap(core); val ii = meanOverlap(idio)
    assert(cc > 2 * ii, f"core-core $cc%.2f should far exceed idio-idio $ii%.2f")
  }

  test("overlap matrix agrees with set intersection") {
    val rng = new scala.util.Random(1)
    for (_ <- 1 to 200) {
      val a = rng.nextInt(u.size); val b = rng.nextInt(u.size)
      val expected = (u.byId(a).profile intersect u.byId(b).profile).size
      if (a != b) assert(u.sharedCount(a, b) == expected, s"pair ($a,$b)")
    }
  }

  test("overlap matrix is symmetric with zero diagonal") {
    val rng = new scala.util.Random(2)
    for (_ <- 1 to 200) {
      val a = rng.nextInt(u.size); val b = rng.nextInt(u.size)
      assert(u.sharedCount(a, b) == u.sharedCount(b, a))
    }
    assert(u.sharedCount(5, 5) == 0) // diagonal unused by construction
  }

  test("synonym targets all exist in the universe") {
    for ((_, canonical) <- FlavorGen.Synonyms) assert(u.byName.contains(canonical))
  }

  test("noise entities are not ingredient names") {
    val names = u.ingredients.map(_.name).toSet
    for (n <- FlavorGen.NoiseEntities) assert(!names(n), s"'$n' is both noise and name")
  }
}
