package repro.rdf

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Deterministic synthetic RDF graph generators.
  *
  * The paper evaluates on six real graphs (Airline, CEOs, DBLP, Foodista,
  * NASA, Nobel). We cannot ship those dumps, so each generator below
  * reproduces the *structural* features that drive every measured claim:
  * heterogeneity (missing properties), multi-valued properties (the source
  * of PGCube errors), URI links (path derivations), text properties
  * (keyword/language derivations) and numeric properties (measures).
  * See DESIGN.md §6 for the substitution argument.
  *
  * All generators are deterministic in their `(scale, seed)` arguments.
  * `scale=1.0` yields graphs of ~10^4..10^5 triples — laptop-sized analogs
  * of the paper's graphs (which range from 85k to 56M triples).
  */
object RdfGen {

  /** A dataset = name + triples; `expected` carries the paper's Table 2 row
    * (triples, CFSs, #P, #A woD, kw, lang, count, path, #A wD) for
    * side-by-side reporting in EXPERIMENTS.md.
    */
  final case class Dataset(name: String, triples: DataFrame,
                           paperRow: Map[String, String] = Map.empty)

  private def n(base: Int, scale: Double): Int = math.max(1, (base * scale).toInt)

  private def toDf(spark: SparkSession, ts: ArrayBuffer[(String, String, String)]): DataFrame = {
    import spark.implicits._
    // An RDF graph is a set of triples — random draws may repeat (s,p,o).
    spark.createDataset(ts.toSeq).toDF("s", "p", "o").distinct().repartition(8)
  }

  // ---------------------------------------------------------------------
  // Airline: originally relational — one type, fixed single-valued schema,
  // mostly numeric, no links, no text => NO derivations possible (paper R1).
  // ---------------------------------------------------------------------
  def airline(spark: SparkSession, scale: Double = 1.0, seed: Long = 11): Dataset = {
    val rnd = new Random(seed)
    val carriers = (1 to 10).map(i => s"C$i")
    val airports = (1 to 30).map(i => s"AP$i")
    val ts = ArrayBuffer.empty[(String, String, String)]
    val nFlights = n(12000, scale)
    for (i <- 0 until nFlights) {
      val s = s"flight$i"
      ts += ((s, Triples.TypeProperty, "Flight"))
      val carrier = carriers(rnd.nextInt(carriers.size))
      ts += ((s, "carrier", carrier))
      ts += ((s, "origin", airports(rnd.nextInt(airports.size))))
      ts += ((s, "dest", airports(rnd.nextInt(airports.size))))
      ts += ((s, "month", (1 + rnd.nextInt(12)).toString))
      ts += ((s, "dayOfWeek", (1 + rnd.nextInt(7)).toString))
      // One chronically late carrier => planted variance outlier.
      val lateBias = if (carrier == "C7") 90.0 else 0.0
      ts += ((s, "depDelay", f"${lateBias + rnd.nextGaussian() * 15 + 10}%.1f"))
      ts += ((s, "arrDelay", f"${lateBias + rnd.nextGaussian() * 18 + 8}%.1f"))
      ts += ((s, "distance", (100 + rnd.nextInt(4000)).toString))
      ts += ((s, "airTime", (30 + rnd.nextInt(400)).toString))
    }
    Dataset("Airline", toDf(spark, ts),
      Map("#triples" -> "56M", "#CFSs" -> "1", "#P" -> "30", "#A_woD" -> "5923",
          "kw" -> "0", "lang" -> "0", "count" -> "0", "path" -> "0", "#A_wD" -> "5923"))
  }

  // ---------------------------------------------------------------------
  // CEOs: highly heterogeneous WikiData extract — multi-valued nationality,
  // managed companies (links => paths), political connections, text
  // descriptions, missing values everywhere. Largest PGCube error source.
  // ---------------------------------------------------------------------
  def ceos(spark: SparkSession, scale: Double = 1.0, seed: Long = 13): Dataset = {
    val rnd = new Random(seed)
    val countries = (1 to 25).map(i => s"Country$i")
    val areas = Seq("Petroleum", "Diamond", "Manufacturer", "Automotive", "NaturalGas",
                    "Banking", "Telecom", "Retail", "Media", "Mining")
    val roles = Seq("President", "Minister", "Senator", "Mayor", "Governor")
    val occupations = Seq("philanthropist", "shareholder", "investor", "founder", "chairman")
    val enWords = Seq("the", "company", "oversees", "production", "global", "leader",
                      "market", "growth", "of", "and")
    val frWords = Seq("le", "la", "entreprise", "production", "mondial", "de", "et",
                      "marche", "croissance", "des")
    val ts = ArrayBuffer.empty[(String, String, String)]

    val nCompanies = n(400, scale)
    for (i <- 0 until nCompanies) {
      val s = s"company$i"
      ts += ((s, Triples.TypeProperty, "Company"))
      // Multi-valued area (1-2 values).
      val nAreas = 1 + rnd.nextInt(2)
      rnd.shuffle(areas).take(nAreas).foreach(a => ts += ((s, "area", a)))
      ts += ((s, "headquarters", countries(rnd.nextInt(countries.size))))
      if (rnd.nextDouble() < 0.8)
        ts += ((s, "revenue", f"${math.exp(rnd.nextGaussian() + 5) * 1e6}%.0f"))
      if (rnd.nextDouble() < 0.6) {
        val words = if (rnd.nextDouble() < 0.7) enWords else frWords
        val desc = (0 until 6).map(_ => words(rnd.nextInt(words.size))).mkString(" ")
        ts += ((s, "description", desc))
      }
    }
    val nPoliticians = n(120, scale)
    for (i <- 0 until nPoliticians) {
      val s = s"politician$i"
      ts += ((s, Triples.TypeProperty, "Politician"))
      ts += ((s, "role", roles(rnd.nextInt(roles.size))))
      ts += ((s, "country", countries(rnd.nextInt(countries.size))))
    }
    val nCeos = n(300, scale)
    for (i <- 0 until nCeos) {
      val s = s"ceo$i"
      ts += ((s, Triples.TypeProperty, "CEO"))
      if (rnd.nextDouble() < 0.7)
        ts += ((s, "gender", if (rnd.nextDouble() < 0.25) "Female" else "Male"))
      if (rnd.nextDouble() < 0.8)
        ts += ((s, "age", (32 + rnd.nextInt(45)).toString))
      // netWorth: log-normal with one planted Dos-Santos-style outlier.
      val nw = if (i == 7) 2.8e9 else math.exp(rnd.nextGaussian() * 1.2 + 16)
      ts += ((s, "netWorth", f"$nw%.0f"))
      // Multi-valued nationality (1-4 values, Ghosn-style).
      val nNat = 1 + (if (rnd.nextDouble() < 0.25) rnd.nextInt(3) + 1 else 0)
      rnd.shuffle(countries).take(nNat).foreach(c => ts += ((s, "nationality", c)))
      if (rnd.nextDouble() < 0.6)
        ts += ((s, "countryOfOrigin", countries(rnd.nextInt(countries.size))))
      if (rnd.nextDouble() < 0.65)
        ts += ((s, "occupation", occupations(rnd.nextInt(occupations.size))))
      // manages: 1-3 company links => path derivations manages/area etc.
      val nComp = 1 + rnd.nextInt(3)
      (0 until nComp).foreach(_ => ts += ((s, "manages", s"company${rnd.nextInt(nCompanies)}")))
      // politicalConnection: 0-2 politician links.
      val nPol = if (rnd.nextDouble() < 0.4) 1 + rnd.nextInt(2) else 0
      (0 until nPol).foreach(_ =>
        ts += ((s, "politicalConnection", s"politician${rnd.nextInt(nPoliticians)}")))
    }
    Dataset("CEOs", toDf(spark, ts),
      Map("#triples" -> "85k", "#CFSs" -> "237", "#P" -> "61", "#A_woD" -> "159",
          "kw" -> "1", "lang" -> "1", "count" -> "37", "path" -> "462", "#A_wD" -> "27860"))
  }

  // ---------------------------------------------------------------------
  // DBLP: bibliographic — one good direct dimension (year), text titles
  // (keywords), multi-valued authors (count derivation), venue links.
  // ---------------------------------------------------------------------
  def dblp(spark: SparkSession, scale: Double = 1.0, seed: Long = 17): Dataset = {
    val rnd = new Random(seed)
    val kws = Seq("database", "graph", "query", "learning", "systems", "distributed",
                  "optimization", "stream", "index", "semantic", "network", "mining")
    val venueNames = (1 to 40).map(i => s"Venue$i")
    val venueKinds = Seq("conference", "journal", "workshop")
    val ts = ArrayBuffer.empty[(String, String, String)]
    val nVenues = venueNames.size
    for (i <- 0 until nVenues) {
      val s = s"venue$i"
      ts += ((s, Triples.TypeProperty, "Venue"))
      ts += ((s, "venueKind", venueKinds(rnd.nextInt(venueKinds.size))))
      ts += ((s, "venueName", venueNames(i)))
    }
    val nPubs = n(8000, scale)
    for (i <- 0 until nPubs) {
      val s = s"pub$i"
      ts += ((s, Triples.TypeProperty, "Publication"))
      ts += ((s, "year", (1970 + rnd.nextInt(50)).toString))
      val title = (0 until 5).map(_ => kws(rnd.nextInt(kws.size))).mkString(" ")
      ts += ((s, "title", title))
      // Multi-valued authors: papers in later years have more authors (trend).
      val nAuth = 1 + rnd.nextInt(6)
      (0 until nAuth).foreach(j => ts += ((s, "author", s"author${rnd.nextInt(3000)}")))
      ts += ((s, "pages", (2 + rnd.nextInt(30)).toString))
      ts += ((s, "publishedIn", s"venue${rnd.nextInt(nVenues)}"))
    }
    Dataset("DBLP", toDf(spark, ts),
      Map("#triples" -> "33M", "#CFSs" -> "1", "#P" -> "21", "#A_woD" -> "1",
          "kw" -> "5", "lang" -> "3", "count" -> "8", "path" -> "19", "#A_wD" -> "961"))
  }

  // ---------------------------------------------------------------------
  // Foodista: recipes — NO usable direct attribute (titles too distinct,
  // ingredients are URIs) => zero aggregates without derivations; counts,
  // language and ingredient/category paths unlock a handful (paper: 14).
  // ---------------------------------------------------------------------
  def foodista(spark: SparkSession, scale: Double = 1.0, seed: Long = 19): Dataset = {
    val rnd = new Random(seed)
    val categories = Seq("Vegetable", "Fruit", "Meat", "Dairy", "Spice", "Grain", "Fish")
    val enWords = Seq("roasted", "chicken", "with", "garlic", "sauce", "fresh", "salad",
                      "baked", "cream", "soup")
    val frWords = Seq("poulet", "roti", "avec", "ail", "sauce", "frais", "salade",
                      "gratin", "creme", "soupe")
    val ts = ArrayBuffer.empty[(String, String, String)]
    val nIngredients = n(250, scale)
    for (i <- 0 until nIngredients) {
      val s = s"ingredient$i"
      ts += ((s, Triples.TypeProperty, "Ingredient"))
      ts += ((s, "category", categories(rnd.nextInt(categories.size))))
      ts += ((s, "ingredientName", s"ing$i"))
    }
    val nRecipes = n(1800, scale)
    for (i <- 0 until nRecipes) {
      val s = s"recipe$i"
      ts += ((s, Triples.TypeProperty, "Recipe"))
      val words = if (rnd.nextDouble() < 0.8) enWords else frWords
      ts += ((s, "recipeTitle", (0 until 4).map(_ => words(rnd.nextInt(words.size))).mkString(" ")))
      val nIng = 2 + rnd.nextInt(9)
      rnd.shuffle((0 until nIngredients).toList).take(nIng)
        .foreach(j => ts += ((s, "ingredient", s"ingredient$j")))
    }
    Dataset("Foodista", toDf(spark, ts),
      Map("#triples" -> "1M", "#CFSs" -> "5", "#P" -> "13", "#A_woD" -> "0",
          "kw" -> "1", "lang" -> "1", "count" -> "6", "path" -> "38", "#A_wD" -> "14"))
  }

  // ---------------------------------------------------------------------
  // NASA: launches + spacecraft — launch sites, links to spacecraft
  // (multi-valued) => agency/discipline/mass paths; numeric masses.
  // ---------------------------------------------------------------------
  def nasa(spark: SparkSession, scale: Double = 1.0, seed: Long = 23): Dataset = {
    val rnd = new Random(seed)
    val sites = Seq("Plesetsk", "Bajkonur", "CapeCanaveral", "Vandenberg", "Kourou",
                    "Tanegashima", "Jiuquan", "Sriharikota") ++ (1 to 17).map(i => s"Site$i")
    val agencies = (1 to 12).map(i => s"Agency$i")
    val disciplines = Seq("HumanCrew", "Microgravity", "LifeSciences", "Repair",
                          "Astronomy", "EarthScience", "Communications", "Navigation",
                          "Meteorology", "Technology")
    val ts = ArrayBuffer.empty[(String, String, String)]
    val nSpacecraft = n(900, scale)
    for (i <- 0 until nSpacecraft) {
      val s = s"spacecraft$i"
      ts += ((s, Triples.TypeProperty, "Spacecraft"))
      ts += ((s, "agency", agencies(rnd.nextInt(agencies.size))))
      // Heavy human-crew craft => planted avg(mass) outlier by discipline.
      val disc = disciplines(rnd.nextInt(disciplines.size))
      val nDisc = 1 + (if (rnd.nextDouble() < 0.3) 1 else 0)
      (rnd.shuffle(disciplines).take(nDisc - 1) :+ disc).distinct
        .foreach(d => ts += ((s, "discipline", d)))
      val mass =
        if (disc == "HumanCrew" || disc == "Repair") 20000 + rnd.nextInt(80000)
        else 200 + rnd.nextInt(5000)
      ts += ((s, "mass", mass.toString))
      if (rnd.nextDouble() < 0.6) {
        val en = Seq("orbital", "mission", "with", "science", "payload", "crew",
                     "station", "research", "module", "observation")
        val fr = Seq("mission", "orbitale", "avec", "scientifique", "charge",
                     "station", "recherche", "module", "observation", "des")
        val words = if (rnd.nextDouble() < 0.8) en else fr
        ts += ((s, "missionDescription",
                (0 until 5).map(_ => words(rnd.nextInt(words.size))).mkString(" ")))
      }
      if (rnd.nextDouble() < 0.5)
        ts += ((s, "crewSize", rnd.nextInt(8).toString))
    }
    val nLaunches = n(1500, scale)
    for (i <- 0 until nLaunches) {
      val s = s"launch$i"
      ts += ((s, Triples.TypeProperty, "Launch"))
      // Skewed launch-site distribution (Plesetsk/Bajkonur dominate).
      val site = if (rnd.nextDouble() < 0.45) sites(rnd.nextInt(2))
                 else sites(rnd.nextInt(sites.size))
      ts += ((s, "launchSite", site))
      ts += ((s, "launchYear", (1957 + rnd.nextInt(60)).toString))
      val nSc = 1 + rnd.nextInt(3)
      (0 until nSc).foreach(_ =>
        ts += ((s, "spacecraft", s"spacecraft${rnd.nextInt(nSpacecraft)}")))
      if (rnd.nextDouble() < 0.7)
        ts += ((s, "rocket", s"Rocket${rnd.nextInt(40)}"))
    }
    Dataset("NASA", toDf(spark, ts),
      Map("#triples" -> "99k", "#CFSs" -> "10", "#P" -> "37", "#A_woD" -> "19",
          "kw" -> "3", "lang" -> "15", "count" -> "3", "path" -> "87", "#A_wD" -> "1449"))
  }

  // ---------------------------------------------------------------------
  // Nobel: laureates — multi-valued countries/affiliations, prize links
  // (category/year paths), numeric shares. Second error-heavy graph.
  // ---------------------------------------------------------------------
  def nobel(spark: SparkSession, scale: Double = 1.0, seed: Long = 29): Dataset = {
    val rnd = new Random(seed)
    val categories = Seq("Physics", "Chemistry", "Medicine", "Literature", "Peace", "Economics")
    val countries = (1 to 40).map(i => s"Country$i")
    val ts = ArrayBuffer.empty[(String, String, String)]
    val nAff = n(200, scale)
    for (i <- 0 until nAff) {
      val s = s"affiliation$i"
      ts += ((s, Triples.TypeProperty, "Affiliation"))
      ts += ((s, "affCountry", countries(rnd.nextInt(countries.size))))
      ts += ((s, "affCity", s"City${rnd.nextInt(80)}"))
    }
    val nLaureates = n(950, scale)
    for (i <- 0 until nLaureates) {
      val lau = s"laureate$i"
      ts += ((lau, Triples.TypeProperty, "Laureate"))
      if (rnd.nextDouble() < 0.95)
        ts += ((lau, "gender", if (rnd.nextDouble() < 0.08) "female" else "male"))
      // Multi-valued born country (emigres) — error source.
      val nBc = 1 + (if (rnd.nextDouble() < 0.2) 1 else 0)
      rnd.shuffle(countries).take(nBc).foreach(c => ts += ((lau, "bornCountry", c)))
      val nA = rnd.nextInt(3)
      (0 until nA).foreach(_ => ts += ((lau, "affiliation", s"affiliation${rnd.nextInt(nAff)}")))
      // One prize per laureate (some laureates share a second prize).
      val nPrizes = 1 + (if (rnd.nextDouble() < 0.03) 1 else 0)
      (0 until nPrizes).foreach { j =>
        val prize = s"prize${i}_$j"
        ts += ((lau, "wonPrize", prize))
        ts += ((prize, Triples.TypeProperty, "Prize"))
        ts += ((prize, "prizeCategory", categories(rnd.nextInt(categories.size))))
        ts += ((prize, "prizeYear", (1901 + rnd.nextInt(119)).toString))
      }
      ts += ((lau, "share", (1 + rnd.nextInt(4)).toString))
      if (rnd.nextDouble() < 0.7) {
        val en = Seq("discovery", "pioneering", "work", "with", "theory", "structure",
                     "development", "methods", "studies", "contributions")
        val fr = Seq("decouverte", "travaux", "avec", "theorie", "structure",
                     "developpement", "methodes", "etudes", "contributions", "des")
        val words = if (rnd.nextDouble() < 0.85) en else fr
        ts += ((lau, "motivation",
                (0 until 5).map(_ => words(rnd.nextInt(words.size))).mkString(" ")))
      }
      if (rnd.nextDouble() < 0.9)
        ts += ((lau, "bornYear", (1840 + rnd.nextInt(140)).toString))
    }
    Dataset("Nobel", toDf(spark, ts),
      Map("#triples" -> "87k", "#CFSs" -> "15", "#P" -> "39", "#A_woD" -> "58",
          "kw" -> "3", "lang" -> "3", "count" -> "18", "path" -> "87", "#A_wD" -> "30658"))
  }

  /** All six real-graph analogs at the given scale. */
  def realGraphs(spark: SparkSession, scale: Double = 1.0): Seq[Dataset] =
    Seq(airline(spark, scale), ceos(spark, scale), dblp(spark, scale),
        foodista(spark, scale), nasa(spark, scale), nobel(spark, scale))

  // ---------------------------------------------------------------------
  // Parametric benchmark graph (paper §6.5): |CFS| facts, N dimensions with
  // given cardinalities, M numeric measures, sparsity s in [0,1] controlling
  // the fraction of occupied cells (as in Agarwal et al. [1]). Generated
  // distributed (spark.range) so multi-million-fact graphs are feasible.
  // ---------------------------------------------------------------------
  def benchmark(spark: SparkSession, nFacts: Long, dimCards: Seq[Int], nMeasures: Int,
                sparsity: Double = 0.1, multiValuedFrac: Double = 0.0,
                seed: Long = 31): DataFrame = {
    import spark.implicits._
    require(dimCards.nonEmpty && nMeasures >= 0)
    val totalCells = dimCards.map(_.toLong).product
    val nCells = math.max(1L, math.min((sparsity * totalCells).toLong, 500000L))
    // Pick nCells distinct linear cell indices, decode into value indices.
    val rnd = new Random(seed)
    val cellIdxs: Seq[Long] =
      if (totalCells <= 4 * nCells) rnd.shuffle((0L until totalCells).toVector).take(nCells.toInt)
      else Iterator.continually(math.abs(rnd.nextLong()) % totalCells)
             .distinct.take(nCells.toInt).toVector
    val cellRows = cellIdxs.zipWithIndex.map { case (lin, i) =>
      var rest = lin
      val vals = dimCards.map { c => val v = (rest % c).toInt; rest /= c; v }
      (i.toLong, vals)
    }
    val cellsDf = cellRows.map { case (i, vals) => (i, vals.mkString(",")) }
      .toDF("cellIdx", "cellVals")
    val facts = spark.range(nFacts)
      .select(col("id"), pmod(xxhash64(col("id"), lit(seed)), lit(nCells)).as("cellIdx"))
      .join(broadcast(cellsDf), "cellIdx")
      .select(col("id"), split(col("cellVals"), ",").as("vals"))
    val dimTriples = dimCards.indices.map { i =>
      facts.select(
        concat(lit("fact"), col("id")).as("s"),
        lit(s"dim$i").as("p"),
        concat(lit(s"d${i}_v"), element_at(col("vals"), i + 1)).as("o"))
    }
    // Optional extra (second) value on each dimension for a random subset of
    // facts — turns the dimension multi-valued to exercise PGCube errors.
    val extraTriples =
      if (multiValuedFrac <= 0) Seq.empty
      else dimCards.indices.map { i =>
        spark.range(nFacts)
          .filter(rand(seed + 100 + i) < multiValuedFrac)
          .select(
            concat(lit("fact"), col("id")).as("s"),
            lit(s"dim$i").as("p"),
            concat(lit(s"d${i}_v"),
                   pmod(xxhash64(col("id"), lit(seed + 200 + i)), lit(dimCards(i))))
              .as("o"))
      }
    val measureTriples = (0 until nMeasures).map { j =>
      spark.range(nFacts).select(
        concat(lit("fact"), col("id")).as("s"),
        lit(s"measure$j").as("p"),
        round(rand(seed + 300 + j) * 1000, 3).cast("string").as("o"))
    }
    val typeTriples = spark.range(nFacts).select(
      concat(lit("fact"), col("id")).as("s"),
      lit(Triples.TypeProperty).as("p"),
      lit("Fact").as("o"))
    (Seq(typeTriples) ++ dimTriples ++ extraTriples ++ measureTriples)
      .reduce(_.unionByName(_))
      .distinct() // the extra multi-value may collide with the base value
  }
}
