package repro.data

import repro.util.Rng

/** Shared vocabularies and deterministic lookup maps for the synthetic
  * evaluation datasets. Mappings (city → state, …) are hash-derived so they
  * are consistent across tuples, which is what makes them genuine functional
  * dependencies in the clean data.
  */
object Vocab {

  val firstNames: IndexedSeq[String] = Vector(
    "james", "mary", "john", "patricia", "robert", "jennifer", "michael",
    "linda", "william", "elizabeth", "david", "barbara", "richard", "susan",
    "joseph", "jessica", "thomas", "sarah", "charles", "karen", "daniel",
    "nancy", "matthew", "lisa", "anthony", "betty", "mark", "sandra",
    "donald", "ashley", "steven", "kimberly", "paul", "emily", "andrew",
    "donna", "joshua", "michelle", "kenneth", "carol")

  val lastNames: IndexedSeq[String] = Vector(
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller",
    "davis", "rodriguez", "martinez", "hernandez", "lopez", "gonzalez",
    "wilson", "anderson", "thomas", "taylor", "moore", "jackson", "martin",
    "lee", "perez", "thompson", "white", "harris", "sanchez", "clark",
    "ramirez", "lewis", "robinson", "walker", "young", "allen", "king",
    "wright", "scott", "torres", "nguyen", "hill", "flores")

  val cities: IndexedSeq[String] = Vector(
    "birmingham", "montgomery", "mobile", "huntsville", "dothan", "florence",
    "gadsden", "tuscaloosa", "anniston", "decatur", "auburn", "hoover",
    "madison", "selma", "troy", "opelika", "athens", "cullman", "fairhope",
    "jasper", "boaz", "ozark", "eufaula", "sylacauga", "alabaster",
    "andalusia", "atmore", "bessemer", "brewton", "clanton", "demopolis",
    "enterprise", "fayette", "foley", "fultondale", "geneva", "greenville",
    "guntersville", "hamilton", "hartselle", "luverne", "monroeville",
    "northport", "oneonta", "pellcity", "prattville", "russellville",
    "scottsboro", "sheffield", "wetumpka")

  val states: IndexedSeq[String] = Vector(
    "al", "ak", "az", "ar", "ca", "co", "ct", "de", "fl", "ga", "hi", "id",
    "il", "in", "ia", "ks", "ky", "la", "me", "md", "ma", "mi", "mn", "ms",
    "mo", "mt", "ne", "nv", "nh", "nj", "nm", "ny", "nc", "nd", "oh", "ok",
    "or", "pa", "ri", "sc", "sd", "tn", "tx", "ut", "vt", "va", "wa", "wv",
    "wi", "wy")

  val counties: IndexedSeq[String] = Vector(
    "jefferson", "mobile", "madison", "montgomery", "shelby", "tuscaloosa",
    "baldwin", "lee", "morgan", "calhoun", "houston", "etowah", "marshall",
    "lauderdale", "talladega", "cullman", "limestone", "dekalb", "walker",
    "stclair")

  /** Deterministic, consistent city attributes — these are the clean FDs. */
  def stateOf(city: String): String  = Rng.pick(states, "cityState", city)
  def zipOf(city: String): String    = (10000 + Rng.int(89999, "cityZip", city)).toString
  def countyOf(city: String): String = Rng.pick(counties, "cityCounty", city)

  val countries: IndexedSeq[String] = Vector(
    "united states", "china", "germany", "russia", "brazil", "india",
    "united kingdom", "france", "italy", "japan", "canada", "australia",
    "south korea", "spain", "mexico", "indonesia", "turkey", "saudi arabia",
    "switzerland", "sweden", "poland", "belgium", "norway", "austria",
    "israel", "ireland", "denmark", "singapore", "malaysia", "chile",
    "finland", "egypt", "philippines", "portugal", "greece", "peru",
    "ukraine", "hungary", "colombia", "thailand")

  val regions: IndexedSeq[String] = Vector(
    "north america", "latin america", "europe", "east asia",
    "south asia", "middle east/north africa", "sub-saharan africa",
    "southeast asia", "oceania")

  def regionOf(country: String): String = Rng.pick(regions, "countryRegion", country)
  def gdpOf(country: String): String =
    ((1 + Rng.int(20000, "countryGdp", country)).toLong * 1000000L).toString

  val beerStyles: IndexedSeq[String] = Vector(
    "american ipa", "american pale ale", "american amber ale", "american blonde ale",
    "american double ipa", "american porter", "american stout", "witbier",
    "hefeweizen", "kolsch", "saison", "fruit beer", "american brown ale",
    "oatmeal stout", "english brown ale", "scottish ale", "pilsner",
    "cream ale", "vienna lager", "marzen")

  val beerWords: IndexedSeq[String] = Vector(
    "hop", "river", "golden", "dark", "summer", "winter", "wild", "old",
    "red", "moon", "sun", "mountain", "valley", "stone", "iron", "copper",
    "amber", "honey", "ghost", "fox", "bear", "eagle", "trail", "harvest",
    "barrel", "smoke", "noble", "royal", "rebel", "prairie")

  val breweryWords: IndexedSeq[String] = Vector(
    "anchor", "summit", "cascade", "ridge", "canyon", "harbor", "lakeside",
    "union", "liberty", "pioneer", "frontier", "heritage", "granite",
    "timber", "meadow", "orchard", "coastal", "highland", "lowland", "delta")

  val journalWords: IndexedSeq[String] = Vector(
    "clinical", "medicine", "surgery", "cancer", "cardiology", "neurology",
    "pediatrics", "epidemiology", "immunology", "pathology", "radiology",
    "oncology", "psychiatry", "dermatology", "nursing", "pharmacy",
    "genetics", "microbiology", "endocrinology", "nephrology")

  val titleWords: IndexedSeq[String] = Vector(
    "randomized", "controlled", "trial", "study", "effects", "analysis",
    "treatment", "patients", "chronic", "acute", "therapy", "clinical",
    "outcomes", "systematic", "review", "evaluation", "comparison",
    "efficacy", "safety", "management", "intervention", "cohort",
    "prospective", "retrospective", "double-blind", "placebo", "disease",
    "syndrome", "diagnosis", "prevention")

  val movieWords: IndexedSeq[String] = Vector(
    "the", "last", "dark", "night", "city", "love", "war", "king", "queen",
    "lost", "secret", "blood", "moon", "star", "dead", "game", "house",
    "world", "man", "woman", "ghost", "dream", "fire", "ice", "shadow",
    "golden", "silent", "broken", "hidden", "rising")

  val genres: IndexedSeq[String] = Vector(
    "drama", "comedy", "action", "thriller", "horror", "romance", "sci-fi",
    "documentary", "animation", "crime", "adventure", "fantasy", "mystery",
    "western", "musical", "biography", "war", "family")

  val languages: IndexedSeq[String] = Vector(
    "english", "french", "german", "spanish", "italian", "japanese",
    "mandarin", "hindi", "korean", "portuguese", "russian", "arabic")

  val sectors: IndexedSeq[String] = Vector(
    "technology", "retail", "finance", "energy", "real estate", "media",
    "healthcare", "telecom", "mining", "construction", "automotive",
    "fashion", "food and beverage", "logistics", "pharmaceuticals",
    "insurance", "hospitality", "agriculture", "aerospace", "chemicals")

  val occupations: IndexedSeq[String] = Vector(
    "engineer", "teacher", "nurse", "accountant", "manager", "clerk",
    "analyst", "technician", "driver", "electrician", "plumber", "chef",
    "designer", "developer", "scientist", "lawyer", "doctor", "pharmacist",
    "architect", "economist")
}
