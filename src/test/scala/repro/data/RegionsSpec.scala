package repro.data

import org.scalatest.funsuite.AnyFunSuite

/** The region table must transcribe the paper's Table 1 and Fig 4 exactly. */
class RegionsSpec extends AnyFunSuite {

  test("there are exactly 22 analysed regions") {
    assert(Regions.all.size == 22)
  }

  test("total recipes across WORLD is 45772 (abstract)") {
    assert(Regions.worldRecipes == 45772)
  }

  test("the unregioned pool has 207 recipes (Materials III.A)") {
    assert(Regions.unregioned.recipes == 207)
  }

  test("Korea is the smallest region with 301 recipes") {
    assert(Regions.all.minBy(_.recipes).code == "KOR")
    assert(Regions.byCode("KOR").recipes == 301)
  }

  test("USA is the largest region with 16118 recipes") {
    assert(Regions.all.maxBy(_.recipes).code == "USA")
    assert(Regions.byCode("USA").recipes == 16118)
  }

  test("Table 1 recipe counts are transcribed exactly") {
    val expected = Map(
      "AFR" -> 651, "ANZ" -> 494, "BRI" -> 1075, "CAN" -> 1112,
      "CBN" -> 1103, "CHN" -> 941, "DACH" -> 487, "EE" -> 565,
      "FRA" -> 2703, "GRC" -> 934, "INSC" -> 4058, "ITA" -> 7504,
      "JPN" -> 580, "KOR" -> 301, "MEX" -> 3138, "ME" -> 993,
      "SCND" -> 404, "SAM" -> 310, "SEA" -> 611, "ESP" -> 816,
      "THA" -> 667, "USA" -> 16118,
    )
    for ((code, n) <- expected) assert(Regions.byCode(code).recipes == n, code)
    assert(expected.keySet == Regions.all.map(_.code).toSet)
  }

  test("Table 1 ingredient counts are transcribed exactly") {
    val expected = Map(
      "AFR" -> 303, "ANZ" -> 294, "BRI" -> 340, "CAN" -> 368,
      "CBN" -> 340, "CHN" -> 302, "DACH" -> 260, "EE" -> 255,
      "FRA" -> 424, "GRC" -> 280, "INSC" -> 378, "ITA" -> 452,
      "JPN" -> 283, "KOR" -> 198, "MEX" -> 376, "ME" -> 313,
      "SCND" -> 245, "SAM" -> 221, "SEA" -> 266, "ESP" -> 312,
      "THA" -> 265, "USA" -> 612,
    )
    for ((code, n) <- expected) assert(Regions.byCode(code).ingredients == n, code)
  }

  test("average unique ingredients per region is about 321 (paper)") {
    val avg = Regions.all.map(_.ingredients).sum.toDouble / Regions.all.size
    assert(math.abs(avg - 321) < 2, f"avg=$avg%.1f")
  }

  test("the 16 positive-pairing regions match Fig 4") {
    assert(Regions.positive.toSet == Set(
      "ITA", "AFR", "CBN", "GRC", "ESP", "USA", "INSC", "ME", "MEX",
      "ANZ", "SAM", "FRA", "THA", "CHN", "SEA", "CAN"))
  }

  test("the 6 negative-pairing regions match Fig 4") {
    assert(Regions.negative.toSet == Set("SCND", "JPN", "DACH", "BRI", "KOR", "EE"))
  }

  test("positive regions are listed in decreasing planted strength") {
    val s = Regions.all.filter(_.zSign > 0).map(_.strength)
    assert(s == s.sorted.reverse)
  }

  test("negative regions are listed in decreasing planted strength") {
    val s = Regions.all.filter(_.zSign < 0).map(_.strength)
    assert(s == s.sorted.reverse)
  }

  test("dairy-heavy regions per Fig 2: FRA, BRI, SCND") {
    for (code <- Seq("FRA", "BRI", "SCND"))
      assert(Regions.byCode(code).emphasis.getOrElse("Dairy", 1.0) > 1.5, code)
  }

  test("spice-heavy regions per Fig 2: INSC, AFR, ME, CBN") {
    for (code <- Seq("INSC", "AFR", "ME", "CBN"))
      assert(Regions.byCode(code).emphasis.getOrElse("Spice", 1.0) > 1.5, code)
  }

  test("byCode covers generated regions including UNREG") {
    assert(Regions.byCode.size == 23)
    assert(Regions.byCode.contains("UNREG"))
  }
}
