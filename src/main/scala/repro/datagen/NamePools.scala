package repro.datagen

import scala.util.Random

/** Term pools and text helpers for the synthetic generator.
  *
  * Replaces the Crunchbase seed corpus of the paper (§3.2): what the seed
  * corpus contributes to the benchmark is (a) plausible name surface forms
  * and (b) *shared* industry / geographic terms across unrelated entities —
  * the paper names these shared terms ("hitech", "networks", "energy",
  * "resources", geographical terms) as the cause of false-positive pairwise
  * predictions on the synthetic companies. Both properties are reproduced
  * here from deterministic pools.
  */
object NamePools {

  val IndustryTerms: Vector[String] = Vector(
    "Hitech", "Networks", "Energy", "Resources", "Systems", "Technologies",
    "Capital", "Pharma", "Mining", "Logistics", "Analytics", "Robotics",
    "Telecom", "Media", "Foods", "Motors", "Airlines", "Software",
    "Biotech", "Solar", "Digital", "Cloud", "Security", "Materials"
  )

  val GeoTerms: Vector[String] = Vector(
    "Swiss", "Global", "Pacific", "Atlantic", "Nordic", "Alpine",
    "Eastern", "Western", "Continental", "International", "National", "Euro"
  )

  val CorporateSuffixes: Vector[String] = Vector(
    "Inc.", "Limited", "Corp", "Holdings", "Group", "AG", "SA", "PLC", "GmbH", "Ltd"
  )

  /** (city, regionFull, regionAbbr, countryName, countryA2, countryA3) */
  val Places: Vector[(String, String, String, String, String, String)] = Vector(
    ("Zurich", "Zurich", "ZH", "Switzerland", "CH", "CHE"),
    ("Geneva", "Geneva", "GE", "Switzerland", "CH", "CHE"),
    ("Lugano", "Ticino", "TI", "Switzerland", "CH", "CHE"),
    ("Austin", "Texas", "TX", "United States", "US", "USA"),
    ("Sunnyvale", "California", "CA", "United States", "US", "USA"),
    ("New York", "New York", "NY", "United States", "US", "USA"),
    ("London", "England", "EN", "United Kingdom", "GB", "GBR"),
    ("Berlin", "Berlin", "BE", "Germany", "DE", "DEU"),
    ("Munich", "Bavaria", "BY", "Germany", "DE", "DEU"),
    ("Paris", "Ile-de-France", "IDF", "France", "FR", "FRA"),
    ("Amsterdam", "North Holland", "NH", "Netherlands", "NL", "NLD"),
    ("Stockholm", "Stockholm", "ST", "Sweden", "SE", "SWE"),
    ("Singapore", "Singapore", "SG", "Singapore", "SG", "SGP"),
    ("Tokyo", "Kanto", "KT", "Japan", "JP", "JPN"),
    ("Sydney", "New South Wales", "NSW", "Australia", "AU", "AUS"),
    ("Toronto", "Ontario", "ON", "Canada", "CA", "CAN"),
    ("Stellenbosch", "Western Cape", "WC", "South Africa", "ZA", "ZAF"),
    ("Mumbai", "Maharashtra", "MH", "India", "IN", "IND")
  )

  val Activities: Vector[String] = Vector(
    "cybersecurity services", "online travel offerings", "wireless broadband",
    "real estate investments", "cloud infrastructure", "payment processing",
    "renewable power generation", "medical diagnostics", "freight forwarding",
    "asset management", "semiconductor design", "retail banking",
    "data analytics tooling", "industrial automation", "video streaming",
    "agricultural commodities", "satellite communication", "drug discovery"
  )

  val Adjectives: Vector[String] =
    Vector("leading", "innovative", "established", "fast-growing", "trusted", "pioneering")

  /** Synonym map used by the rule-based ParaphraseAttribute artifact (stands
    * in for the Pegasus model: semantically equal, lexically different).
    */
  val Synonyms: Map[String, String] = Map(
    "provides" -> "offers", "leading" -> "premier", "innovative" -> "cutting-edge",
    "established" -> "well-known", "fast-growing" -> "rapidly expanding",
    "trusted" -> "reliable", "pioneering" -> "trailblazing",
    "company" -> "firm", "customers" -> "clients", "worldwide" -> "globally",
    "is" -> "operates as", "based" -> "headquartered"
  )

  // deliberately small: at thousands of groups, word collisions across
  // unrelated entities are the false-positive bait the paper describes
  private val Syllables =
    Vector("lan", "ver", "mo", "tek", "ras", "bel", "qui", "nor", "dal",
           "fen", "gar", "hol", "kor", "lum", "mar", "nex", "sol", "vex")

  /** Deterministic pronounceable word from a small collision-prone pool,
    * e.g. "Tekras". Unrelated entities regularly share these words.
    */
  def distinctWord(rng: Random): String =
    (Syllables(rng.nextInt(Syllables.size)) + Syllables(rng.nextInt(Syllables.size))).capitalize

  /** Single-character typo: swaps two adjacent characters (naming noise
    * across vendors, e.g. "Crowdstrike"/"Crowdstirke").
    */
  def typo(word: String, rng: Random): String =
    if (word.length < 4) word
    else {
      val i  = 1 + rng.nextInt(word.length - 2)
      val cs = word.toCharArray
      val t = cs(i); cs(i) = cs(i + 1); cs(i + 1) = t
      new String(cs)
    }

  def pick[A](v: Vector[A], rng: Random): A = v(rng.nextInt(v.size))

  /** Acronym of the core name tokens ("Advanced Lotus Petroleum" -> "ALP"). */
  def acronym(tokens: Seq[String]): String =
    tokens.filter(_.nonEmpty).map(_.head.toUpper).mkString

  /** Rule-based paraphrase: synonym substitution + clause reordering. */
  def paraphrase(text: String): String = {
    val words = text.split(' ').map { w =>
      val bare = w.toLowerCase.stripSuffix(".").stripSuffix(",")
      Synonyms.get(bare) match {
        case Some(s) =>
          val repl = if (w.headOption.exists(_.isUpper)) s.capitalize else s
          repl + w.drop(bare.length)
        case None => w
      }
    }
    val s = words.mkString(" ")
    // clause reorder: "A. B" -> "B A." keeps content, changes token order
    val parts = s.split("\\. ").toSeq
    if (parts.size >= 2) (parts.tail :+ parts.head).mkString(". ") else s
  }

  private val IdChars = "ABCDEFGHIJKLMNOPQRSTUVWXYZ0123456789"

  def randomIdChars(rng: Random, n: Int, digitsOnly: Boolean = false): String =
    if (digitsOnly) Seq.fill(n)(('0' + rng.nextInt(10)).toChar).mkString
    else Seq.fill(n)(IdChars(rng.nextInt(IdChars.length))).mkString

  /** ISIN-shaped identifier: 2-letter country prefix + 9 alnum + check digit. */
  def isin(rng: Random, countryA2: String): String =
    countryA2 + randomIdChars(rng, 9) + rng.nextInt(10)

  def cusip(rng: Random): String = randomIdChars(rng, 9)

  def valor(rng: Random): String = randomIdChars(rng, 9, digitsOnly = true)

  def sedol(rng: Random): String = randomIdChars(rng, 6)
}
