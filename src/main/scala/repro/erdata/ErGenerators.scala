package repro.erdata

import scala.util.Random
import Perturb._

/** Domain-specific entity generators and per-table renderers.
  *
  * A *domain* generates ground-truth entities (driver-side, deterministic in
  * the seed) and renders each entity into a left-table view and a
  * right-table view with domain-appropriate noise and *systematic format
  * divergence* between the two tables (phone separators, venue
  * abbreviations, city abbreviations...) — the property that motivates the
  * paper's three-parameter-set model (§4.3).
  */
object ErGenerators {

  /** One ground-truth entity: attribute name -> canonical value. */
  type Entity = Map[String, String]

  trait Domain {
    def attrs: Seq[String]
    /** `n` distinct entities; index order is meaningful (product families
      * are consecutive runs). */
    def entities(seed: Long, n: Int): IndexedSeq[Entity]
    /** Render entity `i` as a left-table record; `copy` distinguishes
      * intra-table duplicates. */
    def leftView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String]
    def rightView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String]
    protected def rng(seed: Long, side: Int, i: Int, copy: Int): Random =
      new Random(seed * 0x9E3779B97F4A7C15L + side * 0x100000001B3L + i * 1000003L + copy * 7919L)
  }

  // ------------------------------------------------------------------
  // Restaurants (Fodors-Zagats)
  // ------------------------------------------------------------------

  object Restaurants extends Domain {
    val attrs = Seq("name", "addr", "city", "phone", "type", "zipcode", "category")

    private val adjectives = Vector("golden", "blue", "royal", "old", "grand", "little",
      "silver", "happy", "rustic", "urban", "velvet", "copper", "ivory", "crimson",
      "emerald", "lucky", "hidden", "wild", "gentle", "brave", "quiet", "sunny",
      "misty", "amber", "coral", "dusty", "noble", "merry", "stone", "river")
    private val nouns = Vector("dragon", "garden", "palace", "bistro", "grill", "kitchen",
      "table", "oven", "spoon", "fork", "lantern", "rose", "olive", "fig", "anchor",
      "barrel", "hearth", "orchard", "harvest", "pepper", "saffron", "thyme", "basil",
      "juniper", "willow", "magnolia", "terrace", "courtyard", "parlor", "cellar",
      "tavern", "canteen", "pantry", "larder", "griddle", "skillet", "kettle", "crab",
      "heron", "sparrow")
    private val patterns = Vector("the %a %n", "%a %n cafe", "%a %n house", "cafe %n %a")
    private val cuisines = Vector("italian", "french", "chinese", "japanese", "mexican",
      "thai", "indian", "greek", "spanish", "korean", "vietnamese", "american")
    /** Zagat-side relabeling of cuisine types (systematic vocabulary drift). */
    private val cuisineAlt = Map(
      "italian" -> "italian (trattoria)", "french" -> "french (bistro)",
      "chinese" -> "asian", "japanese" -> "sushi", "mexican" -> "tex-mex",
      "thai" -> "asian", "indian" -> "south asian", "greek" -> "mediterranean",
      "spanish" -> "tapas", "korean" -> "asian", "vietnamese" -> "asian",
      "american" -> "american (new)")
    private val cities = Vector("new york", "los angeles", "san francisco", "atlanta",
      "chicago", "boston", "seattle", "austin", "denver", "portland", "miami",
      "houston", "dallas", "phoenix", "detroit", "baltimore", "memphis", "nashville",
      "oakland", "tucson", "omaha", "tulsa", "fresno", "mesa", "raleigh", "wichita",
      "tampa", "orlando", "madison", "savannah", "berkeley", "pasadena")
    private val cityAbbrev = Map("new york" -> "nyc", "los angeles" -> "la",
      "san francisco" -> "sf")
    private val streets = Vector("peachtree", "melrose", "sunset", "broadway", "main",
      "oak", "pine", "maple", "market", "mission", "elm", "cedar", "lake", "hill",
      "valley", "spring")
    private val stSuffix  = Vector("st.", "ave.", "blvd.", "rd.")
    private val categories = Vector("casual", "fine dining", "family", "buffet",
      "bar and grill", "steakhouse", "seafood house", "pizzeria", "diner", "brasserie")

    def entities(seed: Long, n: Int): IndexedSeq[Entity] = {
      val r      = new Random(seed)
      // Enumerate unique (pattern, adjective, noun) name combos so distinct
      // entities never share a name — FZ is the *easy* dataset (F1 ~ 1).
      val combos = r.shuffle(
        for (p <- patterns; a <- adjectives; nn <- nouns)
          yield p.replace("%a", a).replace("%n", nn)
      )
      require(n <= combos.size, s"restaurant name space exhausted: $n > ${combos.size}")
      (0 until n).map { i =>
        val er   = new Random(seed ^ (i * 2654435761L))
        val city = pick(er, cities)
        Map(
          "name"     -> combos(i),
          "addr"     -> s"${er.nextInt(9000) + 100} ${pick(er, streets)} ${pick(er, stSuffix)}",
          "city"     -> city,
          "phone"    -> (0 until 10).map(_ => er.nextInt(10)).mkString,
          "type"     -> pick(er, cuisines),
          "zipcode"  -> (10000 + er.nextInt(89999)).toString,
          "category" -> pick(er, categories),
        )
      }
    }

    private def fmtPhone(d: String, sep1: String, sep2: String): String =
      s"${d.substring(0, 3)}$sep1${d.substring(3, 6)}$sep2${d.substring(6)}"

    def leftView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r = rng(seed, 0, i, copy)
      Seq(
        typos(r, e("name"), 0.01),
        typos(r, e("addr"), 0.01),
        e("city"),
        fmtPhone(e("phone"), "/", "-"),        // fodors: 404/237-2700
        e("type"),
        e("zipcode"),
        e("category"),
      )
    }

    def rightView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r    = rng(seed, 1, i, copy)
      val city = e("city")
      Seq(
        abbrevTokens(r, typos(r, e("name"), 0.01), 0.04),
        typos(r, e("addr"), 0.02) + (if (r.nextDouble() < 0.3) " ne" else ""),
        if (r.nextDouble() < 0.7) cityAbbrev.getOrElse(city, city) else city,
        fmtPhone(e("phone"), "-", "-"),        // zagats: 404-237-2700
        if (r.nextDouble() < 0.6) cuisineAlt(e("type")) else e("type"),
        e("zipcode"),
        e("category"),
      )
    }

    /** A "sibling" left record for transitivity stress (Example 1.3): a
      * *different* entity sharing address/phone/city with entity `e`
      * (the dining room of the same hotel as its cafe).
      */
    def siblingLeftView(seed: Long, i: Int, e: Entity): Seq[String] = {
      val r      = rng(seed, 2, i, 0)
      val prefix = pick(r, Vector("dining room", "bar", "terrace"))
      Seq(
        s"$prefix ${e("name")}",
        e("addr"),
        e("city"),
        fmtPhone(e("phone"), "/", "-"),
        e("type"),
        e("zipcode"),
        e("category"),
      )
    }
  }

  // ------------------------------------------------------------------
  // Citations (DBLP-ACM, DBLP-Scholar)
  // ------------------------------------------------------------------

  /** @param dirty Scholar-style right table: missing venues/years,
    *              truncated titles, heavier typos. */
  final class Citations(dirty: Boolean) extends Domain {
    val attrs = Seq("title", "authors", "venue", "year")

    // A large Zipf-distributed title vocabulary: real paper titles mix a few
    // stopword-like common terms with many rare ones, which is what makes
    // rarest-token blocking effective. Words are composed from syllables
    // (~6000 distinct) and drawn with probability ∝ 1/rank^0.85.
    private val titleVocab: Vector[String] = {
      val a = Vector("data", "query", "graph", "join", "index", "stream", "cache",
        "lock", "hash", "sort", "scan", "tree", "log", "key", "node", "edge",
        "path", "rank", "rule", "type")
      val b = Vector("base", "flow", "form", "gram", "graph", "land", "level",
        "line", "link", "list", "load", "map", "mark", "merge", "mesh", "mine",
        "mix", "model", "net", "pack", "page", "pair", "plan", "point", "pool",
        "port", "probe", "set", "shard", "view")
      val c = Vector("", "s", "ing", "er", "ion", "al", "ic", "ive", "ity", "ment")
      val words = new Random(99).shuffle(for (x <- a; y <- b; z <- c) yield x + y + z)
      words
    }
    private val zipfCdf: Array[Double] = {
      val w = Array.tabulate(titleVocab.size)(k => 1.0 / math.pow(k + 1.0, 0.85))
      val total = w.sum
      var acc = 0.0
      w.map { x => acc += x / total; acc }
    }
    private def zipfWord(r: Random): String = {
      val u = r.nextDouble()
      var lo = 0; var hi = zipfCdf.length - 1
      while (lo < hi) {
        val mid = (lo + hi) / 2
        if (zipfCdf(mid) < u) lo = mid + 1 else hi = mid
      }
      titleVocab(lo)
    }
    private val firstNames = Vector("james", "mary", "wei", "anna", "david", "elena",
      "rahul", "sofia", "michael", "laura", "chen", "maria", "peter", "nina", "omar",
      "julia", "ivan", "grace", "hiro", "fatima", "lucas", "emma", "diego", "aisha",
      "noah", "priya", "felix", "hana", "oscar", "lena")
    private val lastNames = Vector("smith", "johnson", "zhang", "garcia", "mueller",
      "patel", "kim", "rossi", "tanaka", "silva", "ivanov", "nguyen", "kowalski",
      "haddad", "larsen", "dubois", "moreau", "fischer", "romano", "sato", "chen",
      "lopez", "novak", "berg", "costa", "ali", "weber", "marino", "petrov", "yamada")
    private val venues = Vector(
      ("proceedings of the acm sigmod international conference on management of data", "sigmod"),
      ("proceedings of the vldb endowment", "pvldb"),
      ("ieee international conference on data engineering", "icde"),
      ("acm sigkdd conference on knowledge discovery and data mining", "kdd"),
      ("acm symposium on principles of database systems", "pods"),
      ("conference on innovative data systems research", "cidr"),
      ("international conference on extending database technology", "edbt"),
      ("acm transactions on database systems", "tods"))

    def entities(seed: Long, n: Int): IndexedSeq[Entity] =
      (0 until n).map { i =>
        val er     = new Random(seed ^ (i * 2654435761L) + 17)
        val nWords = 7 + er.nextInt(5)
        val title  = (0 until nWords).map(_ => zipfWord(er)).distinct.mkString(" ")
        val nAuth  = 1 + er.nextInt(3)
        val auth   = (0 until nAuth)
          .map(_ => s"${pick(er, firstNames)} ${pick(er, lastNames)}")
          .mkString("; ")
        val v      = er.nextInt(venues.size)
        Map(
          "title"   -> title,
          "authors" -> auth,
          "venue"   -> v.toString, // index; rendered per side
          "year"    -> (1990 + er.nextInt(16)).toString,
        )
      }

    def leftView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r = rng(seed, 0, i, copy)
      Seq(
        typos(r, e("title"), 0.004),
        e("authors"),
        venues(e("venue").toInt)._1, // DBLP: full venue string
        e("year"),
      )
    }

    def rightView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r = rng(seed, 1, i, copy)
      // ACM/Scholar: initials, comma separators, abbreviated venue
      val auth = e("authors").split("; ")
        .map { a =>
          val parts = a.split(" ")
          if (r.nextDouble() < 0.7) s"${parts(0).charAt(0)}. ${parts(1)}" else a
        }
        .mkString(", ")
      if (!dirty) {
        Seq(
          typos(r, e("title"), 0.006),
          auth,
          venues(e("venue").toInt)._2,
          e("year"),
        )
      } else {
        var title = typos(r, e("title"), 0.035)
        title = dropTokens(r, title, 0.18, keepMin = 3)
        if (r.nextDouble() < 0.25) title = truncateTokens(title, 7)
        val year0 = e("year").toInt + (if (r.nextDouble() < 0.12) r.nextInt(3) - 1 else 0)
        Seq(
          title,
          maybeNull(r, dropTokens(r, auth, 0.2), 0.1),
          maybeNull(r, venues(e("venue").toInt)._2, 0.4),
          maybeNull(r, year0.toString, 0.3),
        )
      }
    }
  }

  // ------------------------------------------------------------------
  // Products (Abt-Buy, Amazon-Google)
  // ------------------------------------------------------------------

  /** @param withManufacturer AG-style: separate manufacturer column.
    *
    * Entities come in *families* (same brand + product line, consecutive
    * indices) whose members differ only in model number and a couple of
    * qualifier tokens — the near-miss non-matches that make AB/AG hard for
    * every method in Table 3 (F1 ~ 0.5 even supervised).
    */
  final class Products(withManufacturer: Boolean) extends Domain {
    val attrs: Seq[String] =
      if (withManufacturer) Seq("title", "manufacturer", "price")
      else Seq("name", "description", "price")

    private val brands = Vector("sonic", "voltex", "lumina", "acuview", "nextone",
      "corevia", "zentra", "optimax", "duraline", "brightex", "polaris", "vertexa",
      "quantar", "silvano", "techno", "meridian", "auralis", "nimbus", "cascade",
      "pinnacle", "stratus", "vantage", "fusion", "kinetic", "spectra", "orbital",
      "helix", "matrix", "zenith", "apex")
    private val lines = Vector("power", "cyber", "ultra", "prime", "elite", "vision",
      "sound", "clear", "smart", "turbo", "micro", "mega", "hyper", "pro", "air",
      "max", "neo", "flex", "core", "edge")
    private val modelLetters = Vector("dx", "sx", "tx", "gx", "mx", "vx", "rx", "zx",
      "px", "kx")
    private val qualifiers = Vector("black", "white", "silver", "32gb", "64gb",
      "wireless", "bluetooth", "hd", "1080p", "portable", "compact", "digital",
      "stereo", "rechargeable", "waterproof", "slim", "dual", "premium")
    private val descFiller = Vector("features", "includes", "designed", "quality",
      "performance", "battery", "warranty", "package", "system", "technology",
      "advanced", "easy", "setup", "compatible", "connect", "display", "screen",
      "audio", "video", "power", "cable", "remote", "control", "adapter", "charger",
      "manual", "speaker", "output", "input", "usb", "sleek", "modern", "durable",
      "lightweight", "ergonomic", "high", "resolution", "sound", "bass", "treble")

    def entities(seed: Long, n: Int): IndexedSeq[Entity] = {
      val r       = new Random(seed + 29)
      val combos  = r.shuffle(for (b <- brands; l <- lines; m <- modelLetters) yield (b, l, m))
      val out     = Vector.newBuilder[Entity]
      var familyIdx = 0
      while (out.result().size < n) {
        val (brand, line, ml) = combos(familyIdx % combos.size)
        val famSize   = 1 + r.nextInt(4)            // 1..4 siblings
        val base      = 100 + r.nextInt(800)        // model number base
        val basePrice = 20.0 + r.nextInt(480)
        var k = 0
        while (k < famSize && out.result().size < n) {
          val er    = new Random(seed ^ ((familyIdx * 31L + k) * 2654435761L) + 41)
          val model = s"$ml${base + 10 * k}"
          val quals = pickN(er, qualifiers, 2 + er.nextInt(2))
          val core  = pickN(er, descFiller, 5) :+ model  // entity-specific desc core
          out += Map(
            "brand" -> brand, "line" -> line, "model" -> model,
            "quals" -> quals.mkString(" "),
            "core"  -> core.mkString(" "),
            "price" -> f"${basePrice * (1.0 + 0.12 * k)}%.2f",
          )
          k += 1
        }
        familyIdx += 1
      }
      out.result()
    }

    private def renderName(r: Random, e: Entity, dropBrandP: Double,
                           reformatModelP: Double, requalP: Double): String = {
      val brand = if (r.nextDouble() < dropBrandP) "" else e("brand")
      val model =
        if (r.nextDouble() < reformatModelP)
          e("model").replaceAll("([a-z]+)(\\d+)", "$1-$2")
        else e("model")
      val quals0 = e("quals").split(" ").toSeq
      val quals  =
        if (r.nextDouble() < requalP)
          r.shuffle(quals0).take(1 + r.nextInt(quals0.size)) ++ Seq(pick(r, qualifiers))
        else quals0
      val parts = Seq(brand, e("line"), model) ++ quals
      maybeShuffleTokens(r, parts.filter(_.nonEmpty).mkString(" "), 0.25)
    }

    private def renderDesc(r: Random, e: Entity, coreKeep: Double, nFiller: Int): String = {
      val core   = e("core").split(" ").filter(_ => r.nextDouble() < coreKeep)
      val filler = (0 until nFiller).map(_ => pick(r, descFiller))
      r.shuffle((core ++ filler).toSeq).mkString(" ")
    }

    def leftView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r    = rng(seed, 0, i, copy)
      val name = renderName(r, e, dropBrandP = 0.0, reformatModelP = 0.1, requalP = 0.2)
      if (withManufacturer)
        Seq(typos(r, name, 0.005), e("brand"), maybeNull(r, e("price"), 0.15))
      else
        Seq(typos(r, name, 0.005),
            maybeNull(r, renderDesc(r, e, coreKeep = 0.9, nFiller = 22), 0.25),
            maybeNull(r, e("price"), 0.3))
    }

    def rightView(seed: Long, i: Int, copy: Int, e: Entity): Seq[String] = {
      val r    = rng(seed, 1, i, copy)
      val name = renderName(r, e, dropBrandP = 0.25, reformatModelP = 0.4, requalP = 0.8)
      if (withManufacturer)
        Seq(typos(r, name, 0.01),
            maybeNull(r, if (r.nextDouble() < 0.2) e("brand") + " inc." else e("brand"), 0.3),
            maybeNull(r, jitterNumber(r, e("price"), 0.10), 0.2))
      else
        Seq(typos(r, name, 0.01),
            maybeNull(r, renderDesc(r, e, coreKeep = 0.55, nFiller = 12), 0.5),
            maybeNull(r, jitterNumber(r, e("price"), 0.10), 0.2))
    }
  }
}
