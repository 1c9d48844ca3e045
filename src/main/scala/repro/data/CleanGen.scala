package repro.data

import repro.util.Rng

/** The seven evaluation datasets of the paper (Table II), rebuilt as
  * deterministic synthetic generators with the same schema widths, tuple
  * counts, FD structure and error-type profile.
  *
  * Per-type injection rates are the paper's per-type percentages rescaled so
  * that disjointly-injected cells sum to the paper's overall Err% (the paper's
  * per-type columns overlap and sum above Err%); DESIGN.md documents this
  * substitution.
  */
object CleanGen {

  // ---------------------------------------------------------------- Hospital
  private val measureCodes: IndexedSeq[String] = Vector(
    "scip-card-2", "scip-inf-1", "scip-inf-2", "scip-inf-3", "scip-vte-1",
    "scip-vte-2", "ami-2", "ami-3", "ami-5", "ami-7a", "ami-8a", "pn-2",
    "pn-3b", "pn-5c", "pn-6", "hf-1", "hf-2", "hf-3")

  private val measureWords: IndexedSeq[String] = Vector(
    "patients given", "assessment of", "timing of", "prophylaxis for",
    "evaluation of", "discharge instructions for", "screening for")

  def conditionOf(code: String): String =
    if (code.startsWith("scip")) "surgical infection prevention"
    else if (code.startsWith("ami")) "heart attack"
    else if (code.startsWith("pn")) "pneumonia"
    else "heart failure"

  def measureNameOf(code: String): String =
    Rng.pick(measureWords, "measureName", code) + " " + conditionOf(code) + " care"

  private val hospitalWords: IndexedSeq[String] = Vector(
    "regional", "community", "memorial", "baptist", "general", "university",
    "mercy", "sacred heart", "providence", "saint vincent", "north", "south",
    "east", "west", "valley", "riverside", "lakeview", "central", "county",
    "metro")

  // The real Hospital benchmark has ~100 providers × ~10 measures: every
  // provider attribute repeats across tuples, which is what makes typos and
  // pattern violations detectable as rare variants of frequent values. The
  // generator mirrors that entity structure (all provider attributes are
  // functions of provider_number).
  private val providerIds: IndexedSeq[String] =
    (0 until 100).map(i => (10001 + i * 7).toString)

  def hospNameOf(p: String): String =
    Rng.pick(hospitalWords, "hn1", p) + " " + Rng.pick(hospitalWords, "hn2", p) +
      " hospital"
  def hospAddressOf(p: String): String =
    Schema.renderPattern("### @@@@@@ street", "haddr", p)
  def hospCityOf(p: String): String  = Rng.pick(Vocab.cities, "hcity", p)
  def hospPhoneOf(p: String): String = Schema.renderPattern("##########", "hphone", p)
  def hospIdOf(p: String): String    = Schema.renderPattern("^^###", "hid", p)
  def hospSiteOf(p: String): String  = Schema.renderPattern("www.@@@@@@.org", "hsite", p)

  val hospital: DatasetSpec = DatasetSpec(
    name = "hospital",
    nTuples = 1000,
    attrs = Vector(
      AttrSpec("provider_number", Cat(providerIds, skew = 0.2)),
      AttrSpec("hospital_name", Dep("provider_number", hospNameOf)),
      AttrSpec("address", Dep("provider_number", hospAddressOf)),
      AttrSpec("city", Dep("provider_number", hospCityOf)),
      AttrSpec("state", Dep("city", Vocab.stateOf)),
      AttrSpec("zip", Dep("city", Vocab.zipOf)),
      AttrSpec("county", Dep("city", Vocab.countyOf)),
      AttrSpec("phone", Dep("provider_number", hospPhoneOf)),
      AttrSpec("hospital_type", Cat(Vector("acute care hospitals",
        "critical access hospitals", "childrens hospitals"))),
      AttrSpec("hospital_owner", Cat(Vector("government - state",
        "government - local", "voluntary non-profit", "proprietary",
        "government - federal"))),
      AttrSpec("emergency_service", Cat(Vector("yes", "no"))),
      AttrSpec("measure_code", Cat(measureCodes, skew = 0.3)),
      AttrSpec("condition", Dep("measure_code", conditionOf)),
      AttrSpec("measure_name", Dep("measure_code", measureNameOf)),
      AttrSpec("score", Num(1, 100, 0, suffix = "%")),
      AttrSpec("sample", Num(10, 500, 0, suffix = " patients")),
      AttrSpec("stateavg", Dep2("state", "measure_code", (s, m) => s + "_" + m)),
      AttrSpec("hospital_id", Dep("provider_number", hospIdOf)),
      AttrSpec("website", Dep("provider_number", hospSiteOf)),
      AttrSpec("rating", Num(1, 5, 1)),
    ),
    fds = Seq(FD("provider_number", "hospital_name"), FD("city", "state"),
              FD("city", "zip"), FD("city", "county"),
              FD("measure_code", "condition"), FD("measure_code", "measure_name")),
    // Paper: Err 4.82, (MV 0, PV 2.75, T 2.71, O 2.98, RV 2.05) rescaled.
    rates = Map("MV" -> 0.0, "PV" -> 1.26, "T" -> 1.25, "O" -> 1.37, "RV" -> 0.94),
    nadeefPatterns = Map(
      "zip"   -> "^\\d{5}$",
      "phone" -> "^\\d{10}$",
      "state" -> "^[a-z]{2}$"),
    kb = Seq(kbFromFd(Vocab.cities, "city", "state", Vocab.stateOf,
                      coverage = 0.6, noise = 0.05)),
  )

  // ----------------------------------------------------------------- Flights
  private val flightSources: IndexedSeq[String] = Vector(
    "aa", "airtravelcenter", "allegiantair", "boston", "business-travel",
    "cheapflights", "den", "dfw", "flightarrivals", "flightaware",
    "flightexplorer", "flights", "flightstats", "flightview", "flightwise",
    "flylouisville", "flytecomm", "foxbusiness", "gofox", "helloflight",
    "iad", "ifly", "mco", "mia", "myrateplan", "mytripandmore", "orbitz",
    "ord", "panynj", "phl")

  private val airports = Vector("phx", "msp", "lax", "jfk", "ord", "dfw",
    "atl", "den", "sfo", "mia", "sea", "bos", "iah", "lga", "clt", "ewr")

  private val flightCodes: IndexedSeq[String] = {
    val carriers = Vector("aa", "ua", "co", "dl", "us", "wn")
    (0 until 120).map { i =>
      val c = Rng.pick(carriers, "fcCarrier", i)
      val n = 100 + Rng.int(8900, "fcNum", i)
      val a = Rng.pick(airports, "fcFrom", i)
      val b0 = Rng.pick(airports, "fcTo", i)
      val b = if (b0 == a) Rng.pick(airports, "fcTo2", i) else b0
      s"$c-$n-$a-$b"
    }
  }

  def timeOf(kind: String)(flight: String): String = {
    val h = 1 + Rng.int(12, "fh", kind, flight)
    val m = Rng.int(60, "fm", kind, flight)
    val ap = if (Rng.bool(0.5, "fap", kind, flight)) "a.m." else "p.m."
    f"$h%d:$m%02d $ap"
  }

  val flights: DatasetSpec = DatasetSpec(
    name = "flights",
    nTuples = 2376,
    attrs = Vector(
      AttrSpec("src", Cat(flightSources)),
      AttrSpec("flight", Cat(flightCodes, skew = 0.3)),
      AttrSpec("sched_dep_time", Dep("flight", timeOf("sd"))),
      AttrSpec("act_dep_time", Dep("flight", timeOf("ad"))),
      AttrSpec("sched_arr_time", Dep("flight", timeOf("sa"))),
      AttrSpec("act_arr_time", Dep("flight", timeOf("aa"))),
      AttrSpec("date", Cat(Vector("2011-12-01", "2011-12-02", "2011-12-03"))),
    ),
    fds = Seq(FD("flight", "sched_dep_time"), FD("flight", "sched_arr_time")),
    // Paper: Err 34.51, (MV 16.22, PV 20.12, T 13.92, O 17.52, RV 34.51) rescaled.
    rates = Map("MV" -> 5.47, "PV" -> 6.79, "T" -> 4.70, "O" -> 5.91, "RV" -> 11.64),
    nadeefPatterns = Map(
      "sched_dep_time" -> "^\\d{1,2}:\\d{2} [ap]\\.m\\.$",
      "sched_arr_time" -> "^\\d{1,2}:\\d{2} [ap]\\.m\\.$"),
  )

  // ------------------------------------------------------------------- Beers
  private val breweryIds: IndexedSeq[String] = (1 to 80).map(i => f"b$i%03d")

  def breweryNameOf(id: String): String =
    Rng.pick(Vocab.breweryWords, "bn1", id) + " " +
      Rng.pick(Vocab.breweryWords, "bn2", id) + " brewing"
  def breweryCityOf(id: String): String  = Rng.pick(Vocab.cities, "bcity", id)
  def breweryStateOf(id: String): String = Rng.pick(Vocab.states, "bstate", id)

  val beers: DatasetSpec = DatasetSpec(
    name = "beers",
    nTuples = 2410,
    attrs = Vector(
      AttrSpec("id", IdG("", 4)),
      AttrSpec("beer_name", Words(Vocab.beerWords, 2, 3)),
      AttrSpec("style", Cat(Vocab.beerStyles, skew = 0.3)),
      AttrSpec("ounces", Num(8, 32, 1)),
      AttrSpec("abv", Num(0.03, 0.125, 3)),
      AttrSpec("ibu", Num(5, 120, 0)),
      AttrSpec("brewery_id", Cat(breweryIds, skew = 0.2)),
      AttrSpec("brewery_name", Dep("brewery_id", breweryNameOf)),
      AttrSpec("city", Dep("brewery_id", breweryCityOf)),
      AttrSpec("state", Dep("brewery_id", breweryStateOf)),
      AttrSpec("serving", Cat(Vector("can", "bottle"))),
    ),
    fds = Seq(FD("brewery_id", "brewery_name"), FD("brewery_id", "city"),
              FD("brewery_id", "state")),
    // Paper: Err 12.98, (MV 0.90, PV 9.14, T 2.43, O 1.09, RV 1.12) rescaled.
    rates = Map("MV" -> 0.80, "PV" -> 8.08, "T" -> 2.15, "O" -> 0.96, "RV" -> 0.99),
    nadeefPatterns = Map("abv" -> "^0\\.\\d{3}$", "state" -> "^[a-z]{2}$"),
  )

  // ------------------------------------------------------------------ Rayyan
  private val journalAbbrevs: IndexedSeq[String] =
    Vocab.journalWords.take(40).map(w => s"j $w res")

  def journalTitleOf(ab: String): String = {
    val w = ab.stripPrefix("j ").stripSuffix(" res")
    s"journal of $w research"
  }
  def issnOf(ab: String): String =
    Schema.renderPattern("####-####", "issn", ab)

  val rayyan: DatasetSpec = DatasetSpec(
    name = "rayyan",
    nTuples = 1000,
    attrs = Vector(
      AttrSpec("article_title", Words(Vocab.titleWords, 4, 8)),
      AttrSpec("journal_abbrev", Cat(journalAbbrevs, skew = 0.3)),
      AttrSpec("journal_title", Dep("journal_abbrev", journalTitleOf)),
      AttrSpec("issn", Dep("journal_abbrev", issnOf)),
      AttrSpec("volume", Num(1, 60, 0)),
      AttrSpec("pagination", Patt("###-###")),
      AttrSpec("year", Num(1990, 2020, 0)),
      AttrSpec("language", Cat(Vector("english", "french", "german", "spanish"),
                               skew = 0.8)),
      AttrSpec("issue", Num(1, 12, 0)),
      AttrSpec("authors", Words(Vocab.lastNames, 2, 5)),
      AttrSpec("created", Cat(Vector("2015-01-12", "2015-02-03", "2015-03-22",
        "2015-04-15", "2015-05-30", "2015-06-18"))),
    ),
    fds = Seq(FD("journal_abbrev", "journal_title"), FD("journal_abbrev", "issn")),
    // Paper: Err 29.19, (MV 15.31, PV 9.42, T 3.23, O 8.47, RV 11.40) rescaled.
    rates = Map("MV" -> 9.34, "PV" -> 5.75, "T" -> 1.97, "O" -> 5.17, "RV" -> 6.96),
    nadeefPatterns = Map("issn" -> "^\\d{4}-\\d{4}$", "year" -> "^\\d{4}$"),
  )

  // ------------------------------------------------------------- Billionaire
  val billionaire: DatasetSpec = DatasetSpec(
    name = "billionaire",
    nTuples = 2615,
    attrs = Vector(
      AttrSpec("name", Words(Vocab.firstNames ++ Vocab.lastNames, 2, 2)),
      AttrSpec("rank", Num(1, 2615, 0)),
      AttrSpec("year", Cat(Vector("1996", "2001", "2014"), skew = 0.4)),
      AttrSpec("company_founded", Num(1850, 2010, 0)),
      AttrSpec("company_name", Words(Vocab.breweryWords, 1, 2)),
      AttrSpec("company_relationship", Cat(Vector("founder", "owner",
        "chairman", "investor", "relation"))),
      AttrSpec("company_sector", Cat(Vocab.sectors, skew = 0.3)),
      AttrSpec("company_type", Cat(Vector("new", "acquired", "privatized",
        "aquired"))),
      AttrSpec("demo_age", Num(25, 95, 0)),
      AttrSpec("demo_gender", Cat(Vector("male", "female"), skew = 0.8)),
      AttrSpec("location_citizenship", Cat(Vocab.countries, skew = 0.5)),
      AttrSpec("location_country", Dep("location_citizenship", identity[String])),
      AttrSpec("location_gdp", Dep("location_country", Vocab.gdpOf)),
      AttrSpec("location_region", Dep("location_country", Vocab.regionOf)),
      AttrSpec("wealth_worth", Num(1, 80, 1, suffix = " billion")),
      AttrSpec("wealth_how_category", Cat(Vector("self-made finance",
        "executives", "founder non-finance", "inherited", "privatized and resources"))),
      AttrSpec("wealth_how_industry", Cat(Vocab.sectors.take(18))),
      AttrSpec("wealth_inherited", Cat(Vector("not inherited", "father",
        "3rd generation", "spouse/widow"))),
      AttrSpec("wealth_was_founder", Cat(Vector("true", "false"))),
      AttrSpec("wealth_was_political", Cat(Vector("true", "false"), skew = 0.9)),
      AttrSpec("wealth_type", Cat(Vector("real estate", "new money",
        "old money", "self-made", "privatized"))),
      AttrSpec("position", Num(1, 100, 0)),
    ),
    fds = Seq(FD("location_citizenship", "location_country"),
              FD("location_country", "location_region"),
              FD("location_country", "location_gdp")),
    // Paper: Err 9.84, (MV 2.41, PV 3.14, T 1.35, O 3.80, RV 0.56) rescaled.
    rates = Map("MV" -> 2.11, "PV" -> 2.74, "T" -> 1.18, "O" -> 3.32, "RV" -> 0.49),
    nadeefPatterns = Map("year" -> "^\\d{4}$", "demo_age" -> "^\\d{1,3}$"),
    kb = Seq(kbFromFd(Vocab.countries, "location_country", "location_region",
                      Vocab.regionOf, coverage = 0.7, noise = 0.05)),
  )

  // ------------------------------------------------------------------ Movies
  private val months = Vector("january", "february", "march", "april", "may",
    "june", "july", "august", "september", "october", "november", "december")

  def releaseDateOf(year: String): String = {
    val d = 1 + Rng.int(28, "relDay", year)
    val m = Rng.pick(months, "relMon", year)
    s"$d $m $year"
  }

  val movies: DatasetSpec = DatasetSpec(
    name = "movies",
    nTuples = 7390,
    attrs = Vector(
      AttrSpec("id", IdG("tt", 6)),
      AttrSpec("name", Words(Vocab.movieWords, 1, 4)),
      AttrSpec("year", Num(1920, 2019, 0)),
      AttrSpec("release_date", Dep("year", releaseDateOf)),
      AttrSpec("director", Words(Vocab.lastNames, 1, 2)),
      AttrSpec("creator", Words(Vocab.lastNames, 1, 2)),
      AttrSpec("actors", Words(Vocab.lastNames, 3, 3)),
      AttrSpec("language", Cat(Vocab.languages, skew = 0.8)),
      AttrSpec("country", Cat(Vocab.countries.take(15), skew = 0.8)),
      AttrSpec("duration", Num(60, 240, 0, suffix = " min")),
      AttrSpec("rating_value", Num(1, 10, 1)),
      AttrSpec("rating_count", Num(100, 999999, 0)),
      AttrSpec("review_count", Num(1, 5000, 0, suffix = " user")),
      AttrSpec("genre", Cat(Vocab.genres, skew = 0.4)),
      AttrSpec("filming_locations", Cat(Vocab.cities.take(30))),
      AttrSpec("description", Words(Vocab.movieWords ++ Vocab.titleWords, 8, 15)),
      AttrSpec("pg_rating", Cat(Vector("g", "pg", "pg-13", "r"))),
    ),
    fds = Seq.empty, // Table II reports RV = 0 for Movies
    // Paper: Err 4.97, (MV 2.22, PV 2.32, T 0.03, O 2.64, RV 0) rescaled.
    rates = Map("MV" -> 1.53, "PV" -> 1.60, "T" -> 0.02, "O" -> 1.82, "RV" -> 0.0),
    nadeefPatterns = Map(
      "duration" -> "^\\d+ min$",
      "year"     -> "^\\d{4}$",
      "rating_value" -> "^\\d{1,2}\\.\\d$"),
  )

  // --------------------------------------------------------------------- Tax
  def taxRateOf(state: String): String =
    "%.1f".format(1.0 + Rng.int(90, "taxRate", state) / 10.0)
  def exempOf(kind: String)(state: String): String =
    (500 + Rng.int(80, kind, state) * 50).toString

  val tax: DatasetSpec = DatasetSpec(
    name = "tax",
    nTuples = 200000,
    attrs = Vector(
      AttrSpec("fname", Words(Vocab.firstNames, 1, 1)),
      AttrSpec("lname", Words(Vocab.lastNames, 1, 1)),
      AttrSpec("gender", Cat(Vector("m", "f"))),
      AttrSpec("area_code", Patt("###")),
      AttrSpec("phone", Patt("###-####")),
      AttrSpec("city", Cat(Vocab.cities, skew = 0.3)),
      AttrSpec("state", Dep("city", Vocab.stateOf)),
      AttrSpec("zip", Dep("city", Vocab.zipOf)),
      AttrSpec("marital_status", Cat(Vector("s", "m"))),
      AttrSpec("has_child", Cat(Vector("y", "n"))),
      AttrSpec("salary", Num(10000, 150000, 0)),
      AttrSpec("rate", Dep("state", taxRateOf)),
      AttrSpec("single_exemp", Dep("state", exempOf("sx"))),
      AttrSpec("married_exemp", Dep("state", exempOf("mx"))),
      AttrSpec("child_exemp", Dep("state", exempOf("cx"))),
      AttrSpec("country", Cat(Vector("us"))),
      AttrSpec("email", Dep2("fname", "lname", (a, b) => s"$a.$b@example.com")),
      AttrSpec("ssn", Patt("###-##-####")),
      AttrSpec("account", IdG("ac", 8)),
      AttrSpec("occupation", Cat(Vocab.occupations)),
      AttrSpec("employer", Words(Vocab.breweryWords, 1, 2)),
      AttrSpec("education", Cat(Vector("hs", "bs", "ms", "phd"))),
    ),
    fds = Seq(FD("city", "state"), FD("city", "zip"), FD("state", "rate"),
              FD("state", "single_exemp")),
    // Paper: Err 0.11 (BART-injected, very sparse).
    rates = Map("MV" -> 0.01, "PV" -> 0.04, "T" -> 0.02, "O" -> 0.03, "RV" -> 0.01),
    nadeefPatterns = Map("zip" -> "^\\d{5}$", "ssn" -> "^\\d{3}-\\d{2}-\\d{4}$"),
  )

  val all: Seq[DatasetSpec] =
    Seq(hospital, flights, beers, rayyan, billionaire, movies, tax)

  /** Build a partial, slightly-noisy KB relation from an FD — Katara's KBs in
    * the paper cover some datasets imperfectly; coverage/noise model that.
    */
  private def kbFromFd(lhsDomain: IndexedSeq[String], lhsAttr: String,
                       rhsAttr: String, f: String => String,
                       coverage: Double, noise: Double): KBRelation = {
    val alt = lhsDomain.map(f).distinct
    val mapping = lhsDomain
      .filter(v => Rng.bool(coverage, "kbCov", lhsAttr, v))
      .map { v =>
        val rhs =
          if (Rng.bool(noise, "kbNoise", lhsAttr, v) && alt.size > 1) {
            val wrong = Rng.pick(alt, "kbWrong", lhsAttr, v)
            if (wrong == f(v)) alt((alt.indexOf(wrong) + 1) % alt.size) else wrong
          } else f(v)
        v -> rhs
      }.toMap
    KBRelation(lhsAttr, rhsAttr, mapping)
  }
}
