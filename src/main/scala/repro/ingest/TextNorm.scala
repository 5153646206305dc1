package repro.ingest

/** Text normalization for ingredient phrases (Methodology IV.A).
  *
  * Replaces the paper's NLTK + `inflect` steps: lowercase, strip
  * punctuation/special characters, drop numeric tokens, remove English and
  * culinary stopwords, and singularize every remaining token.
  */
object TextNorm {

  /** Standard English stopwords that appear in ingredient phrases. */
  val EnglishStopwords: Set[String] = Set(
    "a", "an", "the", "of", "and", "or", "to", "with", "in", "for", "on",
    "at", "by", "from", "as", "into", "about", "per", "each", "plus",
    "more", "some", "any", "few", "your", "its", "if", "needed", "about",
  )

  /** Culinary stopwords: units, preparation verbs, size/quality
    * descriptors. PhraseGen draws its decorations only from these (plus
    * numbers), so removal must recover the bare ingredient name.
    */
  val CulinaryStopwords: Set[String] = Set(
    // units
    "cup", "cups", "tablespoon", "tablespoons", "tbsp", "teaspoon",
    "teaspoons", "tsp", "gram", "grams", "kilogram", "kilograms", "ounce",
    "ounces", "oz", "pound", "pounds", "lb", "lbs", "liter", "liters",
    "milliliter", "milliliters", "ml", "pinch", "dash", "handful",
    "sprig", "sprigs", "stick", "sticks", "piece", "pieces",
    "can", "cans", "jar", "jars", "package", "packages", "bunch", "slices",
    // preparation
    "chopped", "diced", "minced", "sliced", "grated", "peeled", "crushed",
    "roasted", "toasted", "boiled", "steamed", "fried", "drained",
    "rinsed", "divided", "softened", "melted", "beaten", "whisked",
    "shredded", "julienned", "halved", "quartered", "cubed", "trimmed",
    "seeded", "stemmed", "pitted", "cored", "slit", "mashed", "pureed",
    "blanched", "marinated", "thawed", "scrubbed", "washed", "deveined",
    // descriptors
    "fresh", "freshly", "finely", "coarsely", "thinly", "thickly",
    "roughly", "lightly", "optional", "taste", "large", "small", "medium",
    "extra", "ripe", "raw", "cooked", "uncooked", "frozen", "canned",
    "dried", "ground", "whole", "boneless", "skinless", "lean", "firm",
    "soft", "warm", "cold", "hot", "room", "temperature", "serving",
    "preferably", "plain", "unsalted", "salted", "low", "reduced",
    "light", "heavy", "organic", "quality", "good", "best", "fine",
  )

  val AllStopwords: Set[String] = EnglishStopwords ++ CulinaryStopwords

  /** Irregular plural → singular map. */
  val IrregularSingulars: Map[String, String] = Map(
    "leaves" -> "leaf", "loaves" -> "loaf", "knives" -> "knife",
    "halves" -> "half", "calves" -> "calf", "wolves" -> "wolf",
    "shelves" -> "shelf", "feet" -> "foot", "geese" -> "goose",
    "children" -> "child", "mice" -> "mouse",
  )

  /** Words ending in 's' that are already singular (never strip). */
  private val SingularEndingInS: Set[String] = Set(
    "molasses", "hummus", "couscous", "asparagus", "citrus", "watercress",
    "swiss", "brussels", "chips",
  )

  /** Rule-based English singularizer (the paper used `inflect`).
    * Handles -ies, -oes, -ves, -xes/-ches/-shes/-sses, and trailing -s.
    */
  def singularize(word: String): String = {
    IrregularSingulars.get(word) match {
      case Some(s) => s
      case None =>
        if (word.length <= 2 || SingularEndingInS(word) || !word.endsWith("s")) word
        else if (word.endsWith("ies") && word.length > 3) word.dropRight(3) + "y"
        else if (word.endsWith("oes") && word.length > 3) word.dropRight(2)
        else if (word.endsWith("xes") || word.endsWith("ches") ||
                 word.endsWith("shes") || word.endsWith("sses")) word.dropRight(2)
        else if (word.endsWith("ss")) word
        else word.dropRight(1)
    }
  }

  /** Rule-based pluralizer, the inverse of [[singularize]] on the name
    * vocabulary (verified by tests). Used by the phrase generator.
    */
  def pluralize(word: String): String = {
    IrregularSingulars.collectFirst { case (p, s) if s == word => p } match {
      case Some(p) => p
      case None =>
        if (word.endsWith("y") && word.length > 1 &&
            !"aeiou".contains(word.charAt(word.length - 2))) word.dropRight(1) + "ies"
        else if (word.endsWith("o") && word.length > 1 &&
                 !"aeiou".contains(word.charAt(word.length - 2))) word + "es"
        else if (word.endsWith("x") || word.endsWith("ch") ||
                 word.endsWith("sh") || word.endsWith("ss")) word + "es"
        else if (word.endsWith("s")) word
        else word + "s"
    }
  }

  private val NonAlpha = "[^a-z]+".r

  /** Full normalization: lowercase → strip punctuation/digits → tokenize →
    * drop stopwords → singularize.
    */
  def normalize(phrase: String): Vector[String] =
    NonAlpha
      .split(phrase.toLowerCase)
      .iterator
      .filter(_.length > 1) // drops bare unit letters like the 'g' of "350g"
      .filterNot(AllStopwords)
      .map(singularize)
      .toVector
}
