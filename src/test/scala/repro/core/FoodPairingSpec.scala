package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

import repro.{Oracle, SparkSpec, TestPipeline}

/** Food-pairing score computation (Methodology IV.B): hand-computed
  * examples, invariants, and a DuckDB oracle cross-check on pipeline data.
  */
class FoodPairingSpec extends AnyFunSuite with SparkSpec {

  import spark.implicits._

  /** Tiny fixture: 3 ingredients; shared(1,2)=4, shared(2,3)=2, (1,3) absent. */
  private def tinyShared: DataFrame =
    Seq((1, 2, 4), (2, 3, 2)).toDF("ing_a", "ing_b", "shared")

  private def tinyRecipes: DataFrame = Seq(
    ("X", 1L, 1), ("X", 1L, 2), ("X", 1L, 3), // N_s = (4+0+2)/3 = 2
    ("X", 2L, 1), ("X", 2L, 2),               // N_s = 4
    ("X", 3L, 1), ("X", 3L, 3),               // N_s = 0 (absent pair)
  ).toDF("region", "recipe_id", "ing_id")

  test("recipePairs emits each unordered pair once") {
    val pairs = FoodPairing.recipePairs(tinyRecipes).collect()
      .map(r => (r.getString(0), r.getLong(1), r.getInt(2), r.getInt(3))).toSet
    assert(pairs == Set(("X", 1L, 1, 2), ("X", 1L, 1, 3), ("X", 1L, 2, 3),
                        ("X", 2L, 1, 2), ("X", 3L, 1, 3)))
  }

  test("recipePairs collapses duplicate slots") {
    val dup = Seq(("X", 1L, 1), ("X", 1L, 1), ("X", 1L, 2)).toDF("region", "recipe_id", "ing_id")
    assert(FoodPairing.recipePairs(dup).count() == 1)
  }

  test("recipeScores match hand computation") {
    val scores = FoodPairing.recipeScores(spark, tinyRecipes, tinyShared)
      .collect().map(r => r.getLong(1) -> r.getDouble(3)).toMap
    assert(math.abs(scores(1L) - 2.0) < 1e-12)
    assert(math.abs(scores(2L) - 4.0) < 1e-12)
    assert(math.abs(scores(3L) - 0.0) < 1e-12)
  }

  test("recipeScores reports recipe sizes") {
    val ns = FoodPairing.recipeScores(spark, tinyRecipes, tinyShared)
      .collect().map(r => r.getLong(1) -> r.getInt(2)).toMap
    assert(ns == Map(1L -> 3, 2L -> 2, 3L -> 2))
  }

  test("single-ingredient recipes are dropped") {
    val one = Seq(("X", 9L, 1)).toDF("region", "recipe_id", "ing_id")
    assert(FoodPairing.recipeScores(spark, one, tinyShared).count() == 0)
  }

  test("cuisineScores averages recipe scores") {
    val cs = FoodPairing.cuisineScores(
      FoodPairing.recipeScores(spark, tinyRecipes, tinyShared)).collect()(0)
    assert(cs.getString(0) == "X")
    assert(math.abs(cs.getDouble(1) - 2.0) < 1e-12) // (2+4+0)/3
    assert(cs.getLong(3) == 3)
  }

  test("cuisineScores sigma is the population stddev of recipe scores") {
    val cs = FoodPairing.cuisineScores(
      FoodPairing.recipeScores(spark, tinyRecipes, tinyShared)).collect()(0)
    val expected = math.sqrt(((2.0 - 2) * (2.0 - 2) + (4.0 - 2) * (4.0 - 2) + (0.0 - 2) * (0.0 - 2)) / 3)
    assert(math.abs(cs.getDouble(2) - expected) < 1e-12)
  }

  test("scores are invariant to slot order and pair orientation") {
    val shuffled = Seq(
      ("X", 1L, 3), ("X", 1L, 1), ("X", 1L, 2),
      ("X", 2L, 2), ("X", 2L, 1),
      ("X", 3L, 3), ("X", 3L, 1),
    ).toDF("region", "recipe_id", "ing_id")
    val a = FoodPairing.recipeScores(spark, tinyRecipes, tinyShared)
      .collect().map(r => r.getLong(1) -> r.getDouble(3)).toMap
    val b = FoodPairing.recipeScores(spark, shuffled, tinyShared)
      .collect().map(r => r.getLong(1) -> r.getDouble(3)).toMap
    assert(a == b)
  }

  test("multiple regions are scored independently") {
    val two = tinyRecipes.unionByName(
      Seq(("Y", 10L, 1), ("Y", 10L, 2)).toDF("region", "recipe_id", "ing_id"))
    val cs = FoodPairing.cuisineScores(FoodPairing.recipeScores(spark, two, tinyShared))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(math.abs(cs("X") - 2.0) < 1e-12)
    assert(math.abs(cs("Y") - 4.0) < 1e-12)
  }

  test("recipe scores on pipeline data agree with the DuckDB oracle") {
    val p = TestPipeline.get(spark)
    val recipes = p.recipes.filter(col("region") === "KOR").cache()
    val ings = recipes.select("ing_id").distinct().as[Int].collect().toSet
    val shared = p.pairShared
      .filter(col("ing_a").isin(ings.toSeq: _*) && col("ing_b").isin(ings.toSeq: _*))
      .cache()
    val got = FoodPairing.recipeScores(spark, recipes, shared)
      .select(col("region"), col("recipe_id").cast("long"),
              col("n").cast("int"), round(col("score"), 6).as("score"))
    Oracle.assertEquivalent(
      got,
      """WITH sizes AS (
        |  SELECT region, CAST(recipe_id AS BIGINT) AS recipe_id,
        |         CAST(COUNT(DISTINCT ing_id) AS INT) AS n
        |  FROM recipes GROUP BY 1, 2
        |), pairs AS (
        |  SELECT a.region, CAST(a.recipe_id AS BIGINT) AS recipe_id,
        |         CAST(a.ing_id AS INT) AS ia, CAST(b.ing_id AS INT) AS ib
        |  FROM (SELECT DISTINCT * FROM recipes) a
        |  JOIN (SELECT DISTINCT * FROM recipes) b
        |    ON a.region = b.region AND a.recipe_id = b.recipe_id
        |   AND CAST(a.ing_id AS INT) < CAST(b.ing_id AS INT)
        |), sums AS (
        |  SELECT p.region, p.recipe_id,
        |         SUM(COALESCE(CAST(s.shared AS INT), 0)) AS sum_sh
        |  FROM pairs p LEFT JOIN shared s
        |    ON CAST(s.ing_a AS INT) = p.ia AND CAST(s.ing_b AS INT) = p.ib
        |  GROUP BY 1, 2
        |)
        |SELECT z.region, z.recipe_id, z.n,
        |       ROUND(2.0 * COALESCE(m.sum_sh, 0) / (z.n * (z.n - 1)), 6) AS score
        |FROM sizes z LEFT JOIN sums m
        |  ON z.region = m.region AND z.recipe_id = m.recipe_id
        |WHERE z.n >= 2""".stripMargin,
      "recipes" -> recipes,
      "shared" -> shared,
    )
  }

  test("empty-profile ingredients contribute zero to every pair") {
    val p = TestPipeline.get(spark)
    val emptyId = p.universe.byName("gelatin").id
    val recipes = Seq(
      ("X", 1L, emptyId), ("X", 1L, p.universe.byName("onion").id),
    ).toDF("region", "recipe_id", "ing_id")
    val score = FoodPairing.recipeScores(spark, recipes, p.pairShared)
      .collect()(0).getDouble(3)
    assert(score == 0.0)
  }
}
