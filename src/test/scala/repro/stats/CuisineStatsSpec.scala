package repro.stats

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

import repro.{Oracle, SparkSpec, TestPipeline}
import repro.data.{CuisineGen, Regions}

/** Corpus statistics (Table 1, Fig 2, Fig 3) — checked against ground
  * truth and the DuckDB oracle.
  */
class CuisineStatsSpec extends AnyFunSuite with SparkSpec {

  import spark.implicits._

  private lazy val p = TestPipeline.get(spark)

  test("table1 counts match the ground-truth corpus at test scale") {
    val got = CuisineStats.table1(p.recipes).collect()
      .map(r => r.getString(0) -> (r.getLong(1), r.getLong(2))).toMap
    val truth = p.groundTruth.groupBy(_.region)
    for (spec <- Regions.all) {
      val rows = truth(spec.code)
      val expected = (rows.size.toLong,
                      rows.flatMap(_.ingredientIds).distinct.size.toLong)
      assert(got(spec.code) == expected, spec.code)
    }
  }

  test("table1 WORLD row aggregates every recipe including UNREG") {
    val got = CuisineStats.table1(p.recipes).collect()
      .map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(got(CuisineStats.World) == p.groundTruth.size)
  }

  test("table1 excludes UNREG as an independent region") {
    val regions = CuisineStats.table1(p.recipes).select("region").as[String].collect()
    assert(!regions.contains(CuisineStats.Unregioned))
    assert(regions.length == 23) // 22 + WORLD
  }

  test("table1 per-region counts scale to Table 1 at full scale") {
    for (spec <- Regions.all) {
      assert(CuisineGen.scaledRecipes(spec, 1.0) == spec.recipes)
      assert(CuisineGen.scaledPool(spec, 1.0) == spec.ingredients)
    }
  }

  test("table1 agrees with the DuckDB oracle") {
    val got = CuisineStats.table1(p.recipes)
      .select(col("region"), col("recipes").cast("long"),
              col("ingredients").cast("long"))
    Oracle.assertEquivalent(
      got,
      """SELECT region, CAST(COUNT(DISTINCT recipe_id) AS BIGINT) AS recipes,
        |       CAST(COUNT(DISTINCT ing_id) AS BIGINT) AS ingredients
        |FROM recipes WHERE region <> 'UNREG' GROUP BY region
        |UNION ALL
        |SELECT 'WORLD', CAST(COUNT(DISTINCT region || '#' || recipe_id) AS BIGINT),
        |       CAST(COUNT(DISTINCT ing_id) AS BIGINT)
        |FROM recipes""".stripMargin,
      "recipes" -> p.recipes,
    )
  }

  test("sizeDistribution counts recipes per size") {
    val hist = CuisineStats.sizeDistribution(p.recipes.filter(col("region") === "KOR"))
      .collect().map(r => r.getInt(1) -> r.getLong(2)).toMap
    val truth = p.groundTruth.filter(_.region == "KOR")
      .groupBy(_.ingredientIds.size).view.mapValues(_.size.toLong).toMap
    assert(hist == truth)
  }

  test("sizeDistribution agrees with the DuckDB oracle") {
    val region = p.recipes.filter(col("region") === "GRC")
    val got = CuisineStats.sizeDistribution(region)
      .select(col("region"), col("n").cast("int"),
              col("recipes_with_n").cast("long"))
    Oracle.assertEquivalent(
      got,
      """WITH sizes AS (
        |  SELECT region, recipe_id, CAST(COUNT(DISTINCT ing_id) AS INT) AS n
        |  FROM recipes GROUP BY 1, 2
        |)
        |SELECT region, n, CAST(COUNT(*) AS BIGINT) AS recipes_with_n
        |FROM sizes GROUP BY 1, 2""".stripMargin,
      "recipes" -> region,
    )
  }

  test("meanRecipeSize is close to nine at test scale") {
    val means = CuisineStats.meanRecipeSize(p.recipes).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    for ((region, m) <- means) assert(m > 7.0 && m < 11.0, f"$region mean=$m%.2f")
  }

  test("popularity ranks are dense from 1 per region") {
    val pop = CuisineStats.popularity(p.recipes.filter(col("region") === "KOR"))
      .collect().map(_.getInt(3)).sorted
    assert(pop.head == 1)
    assert(pop.toSeq == (1 to pop.length))
  }

  test("popularity norm_freq is 1 for the top ingredient and non-increasing") {
    val rows = CuisineStats.popularity(p.recipes.filter(col("region") === "ITA"))
      .orderBy("rank").collect().map(r => (r.getInt(3), r.getDouble(4)))
    assert(rows.head._2 == 1.0)
    rows.sliding(2).foreach {
      case Array((_, a), (_, b)) => assert(b <= a + 1e-12)
      case _ =>
    }
  }

  test("popularity frequencies agree with the DuckDB oracle") {
    val region = p.recipes.filter(col("region") === "SAM")
    val got = CuisineStats.popularity(region)
      .select(col("region"), col("ing_id").cast("int"), col("freq").cast("long"))
    Oracle.assertEquivalent(
      got,
      """SELECT region, CAST(ing_id AS INT) AS ing_id,
        |       CAST(COUNT(DISTINCT recipe_id) AS BIGINT) AS freq
        |FROM recipes GROUP BY 1, 2""".stripMargin,
      "recipes" -> region,
    )
  }

  test("popularitySlope is negative and consistent across regions (Fig 3b)") {
    val slopes = CuisineStats.popularitySlope(p.recipes).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    for ((region, s) <- slopes if region != CuisineStats.Unregioned) {
      assert(s < -0.3 && s > -3.0, f"$region slope=$s%.3f")
    }
    val vals = slopes.view.filterKeys(_ != CuisineStats.Unregioned).values.toVector
    val spread = vals.max - vals.min
    assert(spread < 1.5, f"slope spread $spread%.3f too wide for 'consistent scaling'")
  }

  test("categoryComposition shares sum to one per region") {
    val sums = CuisineStats.categoryComposition(p.recipes, p.ingredients)
      .groupBy("region").agg(sum("share").as("s")).collect()
      .map(r => r.getString(0) -> r.getDouble(1))
    for ((region, s) <- sums) assert(math.abs(s - 1.0) < 1e-9, region)
  }

  test("categoryComposition agrees with the DuckDB oracle") {
    val region = p.recipes.filter(col("region") === "JPN")
    val got = CuisineStats.categoryComposition(region, p.ingredients)
      .filter(col("region") === "JPN")
      .select(col("region"), col("category"), col("uses").cast("long"))
    Oracle.assertEquivalent(
      got,
      """SELECT r.region, i.category, CAST(COUNT(*) AS BIGINT) AS uses
        |FROM recipes r JOIN ingredients i ON r.ing_id = i.ing_id
        |GROUP BY 1, 2""".stripMargin,
      "recipes" -> region,
      "ingredients" -> p.ingredients.select("ing_id", "category"),
    )
  }

  test("withWorld doubles the row count") {
    val n = p.recipes.count()
    assert(CuisineStats.withWorld(p.recipes).count() == 2 * n)
  }
}
