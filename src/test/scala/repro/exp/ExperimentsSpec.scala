package repro.exp

import org.scalatest.funsuite.AnyFunSuite

import repro.{SparkSpec, TestPipeline}
import repro.data.Regions

/** Harness-level tests on the small-scale pipeline: the planted pairing
  * patterns must already be recoverable at reduced scale.
  */
class ExperimentsSpec extends AnyFunSuite with SparkSpec {

  private lazy val p = TestPipeline.get(spark)
  private lazy val pairing =
    Experiments.foodPairing(p, nRand = 1500, regions = Vector("ITA", "AFR", "SCND", "JPN"))

  test("table1 returns all 22 regions plus WORLD in paper order") {
    val rows = Experiments.table1(p)
    assert(rows.size == 23)
    assert(rows.map(_.region) == Experiments.Table1Order :+ "WORLD")
  }

  test("foodPairing emits one row per (region, model)") {
    assert(pairing.size == 4 * 4)
    assert(pairing.map(r => (r.region, r.model)).distinct.size == 16)
  }

  test("planted positive regions show positive Z against random") {
    for (r <- pairing if r.model == "random" && Regions.byCode(r.region).zSign > 0)
      assert(r.z > 3, s"${r.region} z=${r.z}")
  }

  test("planted negative regions show negative Z against random") {
    for (r <- pairing if r.model == "random" && Regions.byCode(r.region).zSign < 0)
      assert(r.z < -3, s"${r.region} z=${r.z}")
  }

  test("frequency model reproduces pairing: |Z_freq| well below |Z_random|") {
    for (region <- Seq("ITA", "AFR", "SCND", "JPN")) {
      val zRand = pairing.find(r => r.region == region && r.model == "random").get.z
      val zFreq = pairing.find(r => r.region == region && r.model == "frequency").get.z
      assert(math.abs(zFreq) < 0.5 * math.abs(zRand),
             f"$region zRand=$zRand%.1f zFreq=$zFreq%.1f")
    }
  }

  test("category model fails to reproduce pairing: |Z_cat| stays large") {
    for (region <- Seq("ITA", "AFR", "SCND", "JPN")) {
      val zRand = pairing.find(r => r.region == region && r.model == "random").get.z
      val zCat = pairing.find(r => r.region == region && r.model == "category").get.z
      // (the threshold is looser than at full scale — small pools blur the
      // category/flavor-class orthogonality; FoodPairingBench asserts the
      // full-scale version of this claim)
      assert(math.abs(zCat) > 0.25 * math.abs(zRand),
             f"$region zRand=$zRand%.1f zCat=$zCat%.1f")
      assert(zCat * zRand > 0, s"$region: category model flipped the sign")
    }
  }

  test("observedSigns extracts the sign of the random-model Z") {
    val signs = Experiments.observedSigns(pairing)
    assert(signs("ITA") == 1 && signs("AFR") == 1)
    assert(signs("SCND") == -1 && signs("JPN") == -1)
  }

  test("topContributors returns k rows per requested region") {
    val signs = Experiments.observedSigns(pairing)
    val rows = Experiments.topContributors(p, signs, k = 3)
    for (region <- signs.keys)
      assert(rows.count(_.region == region) == 3, region)
    assert(rows.forall(r => r.rank >= 1 && r.rank <= 3))
  }

  test("top contributors are popular ingredients (the paper's key factor)") {
    val signs = Experiments.observedSigns(pairing)
    val rows = Experiments.topContributors(p, signs, k = 3)
    // Popularity drives pairing, so top contributors sit in the popular
    // half of the ranking.
    for (r <- rows)
      assert(r.popularityRank <= 40, s"${r.region}/${r.ingredient} popRank=${r.popularityRank}")
  }

  test("meanSizes includes WORLD and stays near nine") {
    val sizes = Experiments.meanSizes(p)
    val world = sizes.find(_.region == "WORLD")
    assert(world.isDefined)
    assert(world.get.meanSize > 7.5 && world.get.meanSize < 10.5)
  }

  test("worldSizeHistogram sums to the corpus size") {
    val hist = Experiments.worldSizeHistogram(p)
    assert(hist.map(_._2).sum == p.groundTruth.size)
  }

  test("categoryComposition covers every region") {
    val rows = Experiments.categoryComposition(p)
    val regions = rows.map(_.region).toSet
    assert(Experiments.Table1Order.forall(regions.contains))
    assert(regions.contains("WORLD"))
  }

  test("fmtTable aligns columns and separates header") {
    val s = Experiments.fmtTable(Seq("a", "bb"), Seq(Seq("1", "2"), Seq("33", "4")))
    val lines = s.split('\n')
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.length == 1)
    assert(lines(1).forall(c => c == '-' || c == '|'))
  }
}
