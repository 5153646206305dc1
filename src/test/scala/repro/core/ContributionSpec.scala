package repro.core

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

import repro.{SparkSpec, TestPipeline}

/** Ingredient contribution χ_i (Methodology IV.C): hand-computed example
  * plus a brute-force cross-check (actually removing the ingredient and
  * re-scoring the cuisine with the production scorer).
  */
class ContributionSpec extends AnyFunSuite with SparkSpec {

  import spark.implicits._

  private def tinyShared = Seq((1, 2, 4), (2, 3, 2)).toDF("ing_a", "ing_b", "shared")
  private def tinyRecipes = Seq(
    ("X", 1L, 1), ("X", 1L, 2), ("X", 1L, 3), // score 2
    ("X", 2L, 1), ("X", 2L, 2),               // score 4
    ("X", 3L, 1), ("X", 3L, 3),               // score 0
  ).toDF("region", "recipe_id", "ing_id")     // N_s = 2

  private lazy val tinyChi = Contribution.chi(spark, tinyRecipes, tinyShared)
    .collect().map(r => r.getInt(1) -> (r.getDouble(2), r.getDouble(3), r.getLong(4))).toMap

  test("removing an overlap-free ingredient raises the cuisine score") {
    // Remove 3: R1 → {1,2} score 4, R2 stays 4, R3 drops ⇒ N_s = 4, χ = +100%.
    val (chi, nsWithout, _) = tinyChi(3)
    assert(math.abs(nsWithout - 4.0) < 1e-12)
    assert(math.abs(chi - 100.0) < 1e-9)
  }

  test("removing the overlap-driving ingredient lowers the cuisine score") {
    // Remove 2: R1 → {1,3} score 0, R2 drops, R3 stays 0 ⇒ N_s = 0, χ = −100%.
    val (chi, nsWithout, _) = tinyChi(2)
    assert(math.abs(nsWithout - 0.0) < 1e-12)
    assert(math.abs(chi - (-100.0)) < 1e-9)
  }

  test("a neutral ingredient yields zero contribution") {
    // Remove 1: R1 → {2,3} score 2, R2 and R3 drop ⇒ N_s = 2, χ = 0.
    val (chi, nsWithout, _) = tinyChi(1)
    assert(math.abs(nsWithout - 2.0) < 1e-12)
    assert(math.abs(chi) < 1e-9)
  }

  test("freq column counts the recipes containing the ingredient") {
    assert(tinyChi(1)._3 == 3)
    assert(tinyChi(2)._3 == 2)
    assert(tinyChi(3)._3 == 2)
  }

  test("chi emits one row per (region, ingredient)") {
    assert(Contribution.chi(spark, tinyRecipes, tinyShared).count() == 3)
  }

  test("chi matches brute-force removal on pipeline data") {
    val p = TestPipeline.get(spark)
    val recipes = p.recipes.filter(col("region") === "KOR").cache()
    val chi = Contribution.chi(spark, recipes, p.pairShared)
      .collect().map(r => r.getInt(1) -> r.getDouble(2)).toMap

    val ns = FoodPairing.cuisineScores(
      FoodPairing.recipeScores(spark, recipes, p.pairShared))
      .collect()(0).getDouble(1)

    // Brute force: physically remove the ingredient and re-score.
    val sampleIngs = chi.keys.toVector.sorted.take(5) ++
      chi.toVector.sortBy(_._2).take(2).map(_._1) // include extreme cases
    for (ing <- sampleIngs.distinct) {
      val without = recipes.filter(col("ing_id") =!= ing)
      val nsWithout = FoodPairing.cuisineScores(
        FoodPairing.recipeScores(spark, without, p.pairShared))
        .collect()(0).getDouble(1)
      val expected = 100.0 * (nsWithout - ns) / ns
      assert(math.abs(chi(ing) - expected) < 1e-6,
             f"ingredient $ing: chi=${chi(ing)}%.6f brute=$expected%.6f")
    }
  }

  test("topContributors ranks by sign-adjusted strength") {
    val signs = Seq(("X", 1)).toDF("region", "sign")
    val top = Contribution.topContributors(tinyChi2Df, signs, k = 2)
      .collect().map(r => (r.getInt(1), r.getInt(2))).toMap // rank -> ing
    // Positive region: strongest contributor = most negative chi (ing 2).
    assert(top(1) == 2)
    assert(top(2) == 1)
  }

  test("topContributors flips ordering for negative regions") {
    val signs = Seq(("X", -1)).toDF("region", "sign")
    val top = Contribution.topContributors(tinyChi2Df, signs, k = 2)
      .collect().map(r => (r.getInt(1), r.getInt(2))).toMap
    // Negative region: strongest contributor = most positive chi (ing 3).
    assert(top(1) == 3)
  }

  test("topContributors limits to k rows per region") {
    val signs = Seq(("X", 1)).toDF("region", "sign")
    assert(Contribution.topContributors(tinyChi2Df, signs, k = 1).count() == 1)
  }

  private def tinyChi2Df =
    Contribution.chi(spark, tinyRecipes, tinyShared)
}
