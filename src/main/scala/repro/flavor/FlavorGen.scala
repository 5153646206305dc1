package repro.flavor

import scala.collection.mutable
import scala.util.Random

/** A single ingredient of the synthetic FlavorDB-lite universe.
  *
  * @param id            stable integer id (index into `FlavorUniverse.ingredients`)
  * @param name          canonical lower-case name (1–3 tokens)
  * @param category      one of `FlavorGen.Categories`
  * @param isCompound    true for the 103 "compound ingredients" whose flavor
  *                      profile is the pooled union of their constituents
  * @param constituents  ids of constituent basic ingredients (compounds only)
  * @param profile       set of flavor-molecule ids (may be empty — the paper's
  *                      4 additives without flavor profiles)
  * @param isCore        true if the profile is drawn mostly from the shared
  *                      200-molecule "core" pool (high mutual overlap class)
  */
final case class IngredientDef(
    id: Int,
    name: String,
    category: String,
    isCompound: Boolean,
    constituents: Vector[Int],
    profile: Set[Int],
    isCore: Boolean,
)

/** The full synthetic flavor universe: ingredients + derived lookups. */
final case class FlavorUniverse(ingredients: Vector[IngredientDef]) {
  val size: Int = ingredients.size

  lazy val byName: Map[String, IngredientDef] = ingredients.map(i => i.name -> i).toMap
  lazy val byId: Map[Int, IngredientDef]      = ingredients.map(i => i.id -> i).toMap

  /** Number of shared flavor molecules for an ingredient pair. */
  def sharedCount(a: Int, b: Int): Int = overlap(a * size + b)

  /** Dense pairwise |F_i ∩ F_j| matrix (row-major, symmetric, 0 diagonal).
    * 943² ints ≈ 3.5 MB — built once via a molecule→ingredients inverted
    * index so construction is O(Σ_m k_m²), not O(n² · |profile|).
    */
  lazy val overlap: Array[Int] = {
    val m = new Array[Int](size * size)
    val inverted = mutable.HashMap.empty[Int, mutable.ArrayBuffer[Int]]
    for (ing <- ingredients; mol <- ing.profile)
      inverted.getOrElseUpdate(mol, mutable.ArrayBuffer.empty) += ing.id
    for (ids <- inverted.valuesIterator) {
      var i = 0
      while (i < ids.length) {
        var j = i + 1
        while (j < ids.length) {
          val a = ids(i); val b = ids(j)
          m(a * size + b) += 1
          m(b * size + a) += 1
          j += 1
        }
        i += 1
      }
    }
    m
  }
}

/** Deterministic generator for the FlavorDB-lite substrate.
  *
  * Mirrors the paper's curation (Materials III.B–C): 840 basic + 103
  * compound ingredients over 21 categories; the 13 specifically added
  * ingredients, the 4 ingredients taken from Ahn et al., and the 7
  * manually added additives (the last 4 with *no* flavor profile);
  * synonym/spelling-variant pairs; and a 29-entry noise blacklist.
  *
  * The synthetic flavor structure is two-class: "core" ingredients draw
  * ~70% of their molecules from a shared 200-molecule pool (high mutual
  * overlap), "idiosyncratic" ingredients draw ~10% from it (low overlap).
  * Class is assigned independently of category — this is the dial that
  * lets region generators plant positive/negative food pairing via
  * popularity alone (see DESIGN.md §2).
  */
object FlavorGen {

  /** The paper's 21 ingredient categories (Materials III.B). */
  val Categories: Vector[String] = Vector(
    "Vegetable", "Dairy", "Legume", "Maize", "Cereal", "Meat",
    "Nuts and Seeds", "Plant", "Fish", "Seafood", "Spice", "Bakery",
    "Beverage Alcoholic", "Beverage", "Essential Oil", "Flower", "Fruit",
    "Fungus", "Herb", "Additive", "Dish",
  )

  /** Sampling weight of each category for generated basic ingredients. */
  private val CategoryWeights: Vector[(String, Double)] = Vector(
    "Vegetable" -> 0.14, "Fruit" -> 0.11, "Plant" -> 0.08, "Spice" -> 0.08,
    "Meat" -> 0.07, "Herb" -> 0.06, "Dairy" -> 0.06, "Cereal" -> 0.05,
    "Fish" -> 0.05, "Legume" -> 0.04, "Nuts and Seeds" -> 0.04,
    "Seafood" -> 0.04, "Beverage" -> 0.04, "Beverage Alcoholic" -> 0.04,
    "Bakery" -> 0.03, "Fungus" -> 0.02, "Essential Oil" -> 0.02,
    "Additive" -> 0.01, "Maize" -> 0.01, "Flower" -> 0.01,
  )

  val NumBasic: Int    = 840
  val NumCompound: Int = 103
  val NumMolecules: Int = 2000
  /** Molecules [0, CoreMolecules) form the shared high-overlap core pool. */
  val CoreMolecules: Int = 200

  /** The paper's 29 "generic and noisy entities" removed from the
    * ingredient list — the aliaser must never match these.
    */
  val NoiseEntities: Vector[String] = Vector(
    "mixture", "garnish", "topping", "seasoning", "filling", "dressing",
    "marinade", "glaze", "coating", "batter", "dough ball", "leftover",
    "accompaniment", "decoration", "sprinkles", "assorted item",
    "misc ingredient", "store brand", "packet", "sachet", "portion",
    "chunk", "slice item", "cube item", "wedge item",
    "strip item", "bundle item", "item", "remainder",
  )

  /** Synonym / spelling-variant surface forms → canonical ingredient name
    * (Materials III.B: bun/lager/curd and whisky/hing/chile variants).
    */
  val Synonyms: Map[String, String] = Map(
    "bun" -> "bread",
    "lager" -> "beer",
    "curd" -> "yogurt",
    "whisky" -> "whiskey",
    "hing" -> "asafoetida",
    "chile" -> "chili",
    "yoghurt" -> "yogurt",
    "aubergine" -> "eggplant",
    "courgette" -> "zucchini",
    "coriander leaf" -> "cilantro",
    "garbanzo" -> "chickpea",
    "maize kernel" -> "corn",
    "scallion" -> "green onion",
    "capsicum" -> "bell pepper",
    "prawn" -> "shrimp",
  )

  /** 13 ingredients the paper added to the FlavorDB-derived list. */
  val AddedIngredients: Vector[(String, String)] = Vector(
    "anise oil" -> "Essential Oil",
    "apple juice" -> "Beverage",
    "coconut milk" -> "Plant",
    "coconut oil" -> "Essential Oil",
    "hops bear" -> "Plant", // name kept verbatim from the paper
    "lemon juice" -> "Beverage",
    "brown rice" -> "Cereal",
    "tomato juice" -> "Beverage",
    "tomato paste" -> "Vegetable",
    "tomato puree" -> "Vegetable",
    "coriander seed" -> "Spice",
    "pork fat" -> "Meat",
    "cured ham" -> "Meat",
  )

  /** 4 ingredients included from Ahn et al. [6]. */
  val AhnIngredients: Vector[(String, String)] = Vector(
    "cayenne" -> "Spice",
    "yeast" -> "Additive",
    "tequila" -> "Beverage Alcoholic",
    "sauerkraut" -> "Vegetable",
  )

  /** 7 manually added additives; the last 4 carry no flavor profile. */
  val Additives: Vector[String] = Vector(
    "baking powder", "monosodium glutamate", "citric acid",
    "cooking spray", "gelatin", "food coloring", "liquid smoke",
  )
  val ProfileFreeAdditives: Set[String] =
    Set("cooking spray", "gelatin", "food coloring", "liquid smoke")

  /** Base nouns for generated ingredient names (all single tokens,
    * disjoint from stopwords/units/descriptors — asserted in tests).
    */
  val BaseNouns: Vector[String] = Vector(
    "onion", "garlic", "tomato", "potato", "carrot", "cabbage", "spinach",
    "pea", "bean", "lentil", "chickpea", "corn", "rice", "wheat", "barley",
    "oat", "bread", "butter", "milk", "cream", "cheese", "yogurt", "egg",
    "chicken", "beef", "pork", "lamb", "bacon", "ham", "sausage", "salmon",
    "tuna", "cod", "shrimp", "crab", "lobster", "oyster", "mussel", "squid",
    "pepper", "chili", "paprika", "cumin", "coriander", "turmeric", "ginger", "cinnamon",
    "clove", "cardamom", "nutmeg", "saffron", "vanilla", "basil", "oregano",
    "thyme", "rosemary", "sage", "parsley", "cilantro", "dill", "mint",
    "fennel", "anise", "mustard", "sesame", "almond", "walnut", "cashew",
    "peanut", "hazelnut", "pistachio", "pecan", "apple", "banana", "orange",
    "lemon", "lime", "mango", "pineapple", "grape", "strawberry",
    "raspberry", "blueberry", "cherry", "peach", "pear", "plum", "apricot",
    "fig", "date", "raisin", "coconut", "avocado", "olive", "mushroom",
    "truffle", "honey", "sugar", "salt", "vinegar", "wine", "beer",
    "whiskey", "rum", "vodka", "brandy", "coffee", "tea", "cocoa",
    "chocolate", "flour", "noodle", "pasta", "tofu", "miso", "seaweed",
    "kale", "leek", "celery", "radish", "turnip", "beet", "pumpkin",
    "zucchini", "eggplant", "cucumber", "lettuce", "broccoli",
    "cauliflower", "asparagus", "artichoke", "okra", "squash", "yam",
    "cassava", "plantain", "quinoa", "millet", "rye", "duck", "turkey",
    "goose", "quail", "venison", "rabbit", "anchovy", "sardine",
    "mackerel", "trout", "herring", "catfish", "tilapia", "scallop",
    "clam", "caper", "shallot", "horseradish", "wasabi", "tamarind",
    "molasses", "syrup", "gherkin", "asafoetida", "oil", "lard", "suet",
    "broth", "stock", "jam", "jelly", "marmalade", "cider", "ale", "mead",
    "sake", "soju", "gin", "port", "sherry", "nectar", "papaya", "guava",
    "lychee", "persimmon", "pomegranate", "kiwi", "melon", "watermelon",
    "cranberry", "gooseberry", "currant", "elderberry", "mulberry",
  )

  /** Modifier tokens for generated two-token names. */
  val Modifiers: Vector[String] = Vector(
    "red", "green", "black", "white", "yellow", "purple", "golden",
    "silver", "sweet", "bitter", "sour", "wild", "baby", "spring",
    "winter", "summer", "autumn", "holy", "royal", "highland", "island",
    "valley", "forest", "desert", "alpine", "coastal", "northern",
    "southern", "eastern", "western", "smoked", "bell",
  )

  /** Curated multi-token compound-ingredient names (incl. the paper's
    * 'half half' and 'mayonnaise' examples); the rest are generated.
    */
  private val CuratedCompounds: Vector[String] = Vector(
    "half half", "mayonnaise", "ketchup", "garam masala", "curry powder",
    "soy sauce", "fish sauce", "worcestershire sauce", "hoisin sauce",
    "pesto", "salsa", "hummus", "tahini", "berry mix", "five spice",
    "chili paste", "barbecue sauce", "teriyaki sauce", "oyster sauce",
    "ranch dip",
  )

  /** Names that must exist as basics for synonym targets / curated
    * compound constituents even if the noun lists miss them.
    */
  private val RequiredBasics: Vector[(String, String)] = Vector(
    "green onion" -> "Vegetable",
    "bell pepper" -> "Vegetable",
  )

  /** Build the deterministic universe. Same seed → identical universe. */
  def universe(seed: Long = 42L): FlavorUniverse = {
    val rng = new Random(seed)
    val defs = Vector.newBuilder[IngredientDef]
    val usedNames = mutable.HashSet.empty[String]
    var nextId = 0

    val catCum: Vector[(String, Double)] = {
      val total = CategoryWeights.map(_._2).sum
      var acc = 0.0
      CategoryWeights.map { case (c, w) => acc += w / total; (c, acc) }
    }
    def drawCategory(): String = {
      val u = rng.nextDouble()
      catCum.find(_._2 >= u).map(_._1).getOrElse(catCum.last._1)
    }

    def drawProfile(isCore: Boolean): Set[Int] = {
      val sz = 8 + math.round(72.0 * math.pow(rng.nextDouble(), 2.0)).toInt
      val coreFrac = if (isCore) 0.7 else 0.1
      val s = mutable.HashSet.empty[Int]
      var guard = 0
      while (s.size < sz && guard < sz * 20) {
        val mol =
          if (rng.nextDouble() < coreFrac) rng.nextInt(CoreMolecules)
          else CoreMolecules + rng.nextInt(NumMolecules - CoreMolecules)
        s += mol
        guard += 1
      }
      s.toSet
    }

    def addBasic(name: String, category: String, emptyProfile: Boolean = false): Int = {
      require(usedNames.add(name), s"duplicate ingredient name: $name")
      val isCore = rng.nextDouble() < 0.5
      val profile = if (emptyProfile) Set.empty[Int] else drawProfile(isCore)
      val id = nextId
      defs += IngredientDef(id, name, category, isCompound = false, Vector.empty, profile, isCore)
      nextId += 1
      id
    }

    // 1. Curated specials, in paper order.
    AddedIngredients.foreach { case (n, c) => addBasic(n, c) }
    AhnIngredients.foreach { case (n, c) => addBasic(n, c) }
    Additives.foreach(n => addBasic(n, "Additive", emptyProfile = ProfileFreeAdditives(n)))
    RequiredBasics.foreach { case (n, c) => addBasic(n, c) }

    // 2. Bare base nouns.
    for (n <- BaseNouns if !usedNames(n)) addBasic(n, drawCategory())

    // 3. Modifier + noun combos (deterministically shuffled) until 840.
    val combos = rng.shuffle(for (m <- Modifiers; b <- BaseNouns) yield s"$m $b")
    val comboIt = combos.iterator
    while (nextId < NumBasic && comboIt.hasNext) {
      val n = comboIt.next()
      if (!usedNames(n)) addBasic(n, drawCategory())
    }
    require(nextId == NumBasic, s"only $nextId basic ingredients generated")

    val basics = defs.result()
    val basicById = basics.toVector

    // 4. Compound ingredients: curated names first, then generated
    //    "<noun> sauce/paste/mix/blend" names. Profiles are pooled unions
    //    of constituents (Materials III.C).
    val compoundDefs = Vector.newBuilder[IngredientDef]
    def addCompound(name: String, constituents: Vector[Int], category: String): Unit = {
      require(usedNames.add(name), s"duplicate compound name: $name")
      val profile = constituents.flatMap(basicById(_).profile).toSet
      // A compound is "core-class" if the majority of constituents are.
      val isCore = constituents.count(basicById(_).isCore) * 2 > constituents.size
      compoundDefs += IngredientDef(nextId, name, category, isCompound = true,
                                    constituents, profile, isCore)
      nextId += 1
    }
    def idOf(name: String): Int = basics.find(_.name == name).get.id

    addCompound("half half", Vector(idOf("milk"), idOf("cream")), "Dairy")
    addCompound("mayonnaise", Vector(idOf("oil"), idOf("egg"), idOf("lemon juice")), "Dish")
    addCompound("berry mix", Vector(idOf("strawberry"), idOf("raspberry"), idOf("blueberry")), "Fruit")
    for (n <- CuratedCompounds if !usedNames(n)) {
      val k = 2 + rng.nextInt(3)
      val cons = rng.shuffle(basics.indices.toVector).take(k)
      val cat = if (n.endsWith("masala") || n.endsWith("spice") || n.endsWith("powder")) "Spice" else "Dish"
      addCompound(n, cons, cat)
    }
    val suffixes = Vector("sauce", "paste", "mix", "blend")
    val nounIt = rng.shuffle(BaseNouns).iterator
    while (nextId < NumBasic + NumCompound && nounIt.hasNext) {
      val noun = nounIt.next()
      val name = s"$noun ${suffixes(rng.nextInt(suffixes.size))}"
      if (!usedNames(name)) {
        val k = 2 + rng.nextInt(3)
        val cons = rng.shuffle(basics.indices.toVector).take(k)
        addCompound(name, cons, "Dish")
      }
    }
    require(nextId == NumBasic + NumCompound,
            s"only ${nextId - NumBasic} compound ingredients generated")

    val all = basicById ++ compoundDefs.result()
    // Synonym targets must resolve to real ingredients.
    val names = all.map(_.name).toSet
    for ((_, canonical) <- Synonyms)
      require(names(canonical), s"synonym target missing from universe: $canonical")
    FlavorUniverse(all)
  }
}
