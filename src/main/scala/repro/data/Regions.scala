package repro.data

/** Specification of one geo-cultural region of CulinaryDB.
  *
  * @param code        region code used throughout (paper's Table 1 codes)
  * @param name        full region name
  * @param recipes     recipe count (paper Table 1, exact)
  * @param ingredients unique mapped-ingredient count (paper Table 1, exact)
  * @param zSign       planted food-pairing direction (+1 uniform blend,
  *                    −1 contrasting blend — paper Fig 4)
  * @param strength    planted bias strength; larger magnitude ⇒ larger |Z|.
  *                    Ordered to follow the paper's Fig-4 ordering.
  * @param emphasis    category → popularity multiplier (paper Fig 2:
  *                    dairy-heavy FRA/BRI/SCND, spice-heavy INSC/AFR/ME/CBN)
  */
final case class RegionSpec(
    code: String,
    name: String,
    recipes: Int,
    ingredients: Int,
    zSign: Int,
    strength: Double,
    emphasis: Map[String, Double],
)

/** The 22 regions of Table 1, plus the 207 unregioned recipes (Portugal,
  * Belgium, Central America, Netherlands) that enter only the WORLD
  * aggregate (Materials III.A). Total recipes = 45,772.
  */
object Regions {

  private val spice = Map("Spice" -> 2.4, "Herb" -> 1.5)
  private val dairy = Map("Dairy" -> 3.0, "Bakery" -> 1.5)

  // `strength` descends along the paper's Fig-4 listing order so our Z
  // magnitudes roughly reproduce the reported ordering.
  val all: Vector[RegionSpec] = Vector(
    RegionSpec("ITA",  "Italy",               7504, 452, +1, 3.0, Map("Herb" -> 1.5)),
    RegionSpec("AFR",  "Africa",               651, 303, +1, 2.8, spice),
    RegionSpec("CBN",  "Caribbean",           1103, 340, +1, 2.6, spice),
    RegionSpec("GRC",  "Greece",               934, 280, +1, 2.5, Map("Herb" -> 1.5)),
    RegionSpec("ESP",  "Spain",                816, 312, +1, 2.4, Map.empty),
    RegionSpec("USA",  "USA",                16118, 612, +1, 2.3, Map.empty),
    RegionSpec("INSC", "Indian Subcontinent", 4058, 378, +1, 2.2, spice),
    RegionSpec("ME",   "Middle East",          993, 313, +1, 2.1, spice),
    RegionSpec("MEX",  "Mexico",              3138, 376, +1, 2.0, Map("Spice" -> 1.6)),
    RegionSpec("ANZ",  "Australia & NZ",       494, 294, +1, 1.8, Map.empty),
    RegionSpec("SAM",  "South America",        310, 221, +1, 1.7, Map.empty),
    RegionSpec("FRA",  "France",              2703, 424, +1, 1.5, dairy),
    RegionSpec("THA",  "Thailand",             667, 265, +1, 1.4, Map("Spice" -> 1.5)),
    RegionSpec("CHN",  "China",                941, 302, +1, 1.2, Map.empty),
    RegionSpec("SEA",  "South East Asia",      611, 266, +1, 1.0, Map("Spice" -> 1.4)),
    RegionSpec("CAN",  "Canada",              1112, 368, +1, 0.8, Map.empty),
    RegionSpec("SCND", "Scandinavia",          404, 245, -1, 3.0, dairy),
    RegionSpec("JPN",  "Japan",                580, 283, -1, 2.6, Map("Fish" -> 2.0, "Seafood" -> 1.8)),
    RegionSpec("DACH", "DACH Countries",       487, 260, -1, 2.2, Map("Meat" -> 1.4)),
    RegionSpec("BRI",  "British Isles",       1075, 340, -1, 1.8, dairy),
    RegionSpec("KOR",  "Korea",                301, 198, -1, 1.4, Map("Vegetable" -> 1.3)),
    RegionSpec("EE",   "Eastern Europe",       565, 255, -1, 1.0, Map("Meat" -> 1.3)),
  )

  /** Recipes from Portugal/Belgium/Central America/Netherlands — counted
    * in WORLD aggregates only, never analysed as an independent region.
    */
  val unregioned: RegionSpec =
    RegionSpec("UNREG", "Unregioned", 207, 150, +1, 0.5, Map.empty)

  /** All generation targets, including the unregioned pool. */
  val generated: Vector[RegionSpec] = all :+ unregioned

  val byCode: Map[String, RegionSpec] = generated.map(r => r.code -> r).toMap

  /** Total recipe count across WORLD = 45,772 (paper abstract). */
  val worldRecipes: Int = generated.map(_.recipes).sum

  val positive: Vector[String] = all.filter(_.zSign > 0).map(_.code)
  val negative: Vector[String] = all.filter(_.zSign < 0).map(_.code)
}
