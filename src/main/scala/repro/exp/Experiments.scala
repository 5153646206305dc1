package repro.exp

import org.apache.spark.sql.{DataFrame, Row}
import org.apache.spark.sql.functions._

import repro.core.{Contribution, FoodPairing, RandomModels, ZScore}
import repro.data.Regions
import repro.pipeline.Pipeline
import repro.stats.CuisineStats

/** Harness logic shared by the spark-submit jobs (jobs/) and the bench
  * suites (bench/): each paper table/figure has one entry point returning
  * plain rows ready for printing and assertion.
  */
object Experiments {

  /** Paper Table-1 row order (alphabetical by region name, as printed). */
  val Table1Order: Vector[String] = Vector(
    "AFR", "ANZ", "BRI", "CAN", "CBN", "CHN", "DACH", "EE", "FRA", "GRC",
    "INSC", "ITA", "JPN", "KOR", "MEX", "ME", "SCND", "SAM", "SEA", "ESP",
    "THA", "USA",
  )

  /** The analysis-ready recipe table restricted to the 22 true regions. */
  def regionalRecipes(p: Pipeline): DataFrame =
    p.recipes.filter(col("region") =!= CuisineStats.Unregioned)

  // ── Table 1 ────────────────────────────────────────────────────────────

  final case class Table1Row(region: String, recipes: Long, ingredients: Long)

  def table1(p: Pipeline): Vector[Table1Row] = {
    val rows = CuisineStats.table1(p.recipes).collect()
      .map(r => Table1Row(r.getString(0), r.getLong(1), r.getLong(2)))
      .map(t => t.region -> t).toMap
    (Table1Order :+ CuisineStats.World).map(rows)
  }

  // ── Fig 2: category composition ────────────────────────────────────────

  final case class CategoryRow(region: String, category: String, share: Double)

  def categoryComposition(p: Pipeline): Vector[CategoryRow] =
    CuisineStats.categoryComposition(p.recipes, p.ingredients).collect()
      .map(r => CategoryRow(r.getString(0), r.getString(1), r.getDouble(3)))
      .toVector

  // ── Fig 3: recipe sizes and popularity ────────────────────────────────

  final case class SizeRow(region: String, meanSize: Double, maxSize: Int)

  def meanSizes(p: Pipeline): Vector[SizeRow] =
    CuisineStats.meanRecipeSize(CuisineStats.withWorld(regionalRecipes(p)))
      .collect()
      .map(r => SizeRow(r.getString(0), r.getDouble(1), r.getInt(2)))
      .toVector

  def popularitySlopes(p: Pipeline): Vector[(String, Double)] =
    CuisineStats.popularitySlope(regionalRecipes(p)).collect()
      .map(r => (r.getString(0), r.getDouble(1)))
      .toVector

  /** World recipe-size histogram (n → count). */
  def worldSizeHistogram(p: Pipeline): Vector[(Int, Long)] =
    CuisineStats.sizeDistribution(
      p.recipes.withColumn("region", lit(CuisineStats.World)))
      .collect()
      .map(r => (r.getInt(1), r.getLong(2)))
      .sortBy(_._1)
      .toVector

  // ── Fig 4: food pairing Z-scores ──────────────────────────────────────

  final case class PairingRow(region: String, model: String, nsReal: Double,
                              nsRand: Double, sigmaRand: Double, nRand: Long,
                              z: Double)

  /** Compute Z for every (region, null model). Processes one sampled
    * cuisine at a time so at most one n_rand-recipe model is materialized.
    */
  def foodPairing(p: Pipeline, nRand: Int, seed: Long = 11L,
                  regions: Vector[String] = Table1Order): Vector[PairingRow] = {
    val spark = p.spark
    val regional = regionalRecipes(p)
    val realNs: Map[String, Double] =
      FoodPairing.cuisineScores(FoodPairing.recipeScores(spark, regional, p.pairShared))
        .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap

    val out = Vector.newBuilder[PairingRow]
    for (region <- regions) {
      val prof = RandomModels.profile(spark, region, regional, p.ingredients)
      for (model <- RandomModels.AllModels) {
        val sampled = RandomModels.sample(spark, prof, model, nRand, seed)
        val cs = FoodPairing.cuisineScores(
          FoodPairing.recipeScores(spark, sampled, p.pairShared)).collect()(0)
        val nsRand = cs.getDouble(1); val sigma = cs.getDouble(2); val n = cs.getLong(3)
        out += PairingRow(region, model.name, realNs(region), nsRand, sigma, n,
                          ZScore.z(realNs(region), nsRand, sigma, n))
      }
    }
    out.result()
  }

  /** Observed pairing sign per region from the Random-model Z. */
  def observedSigns(rows: Vector[PairingRow]): Map[String, Int] =
    rows.filter(_.model == RandomModels.RandomUniform.name)
      .map(r => r.region -> (if (r.z >= 0) 1 else -1)).toMap

  // ── Fig 5: top contributing ingredients ───────────────────────────────

  final case class ContributorRow(region: String, rank: Int, ingredient: String,
                                  chi: Double, freq: Long, popularityRank: Int)

  def topContributors(p: Pipeline, signs: Map[String, Int], k: Int = 3): Vector[ContributorRow] = {
    import p.spark.implicits._
    val signsDf = signs.toSeq.toDF("region", "sign")
    val chi = Contribution.chi(p.spark, regionalRecipes(p), p.pairShared)
    val pop = CuisineStats.popularity(regionalRecipes(p))
      .select(col("region"), col("ing_id"), col("rank").as("pop_rank"))
    Contribution.topContributors(chi, signsDf, k)
      .join(broadcast(p.ingredients.select("ing_id", "name")), "ing_id")
      .join(pop, Seq("region", "ing_id"))
      .select("region", "rank", "name", "chi", "freq", "pop_rank")
      .collect()
      .map(r => ContributorRow(r.getString(0), r.getInt(1), r.getString(2),
                               r.getDouble(3), r.getLong(4), r.getInt(5)))
      .toVector
      .sortBy(r => (r.region, r.rank))
  }

  // ── formatting ────────────────────────────────────────────────────────

  /** Fixed-width ASCII table (printed by jobs and benches). */
  def fmtTable(headers: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = headers +: rows
    val widths = headers.indices.map(i => all.map(_(i).length).max)
    def line(cells: Seq[String]) =
      cells.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(headers) +: sep +: rows.map(line)).mkString("\n")
  }
}
