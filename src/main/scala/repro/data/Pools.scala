package repro.data

/** Deterministic value pools for the synthetic benchmark relations. The six
  * paper datasets are proprietary CSVs; these pools mirror their value
  * *shapes* (formats, cardinalities, FD structure) so the cleaning problem is
  * equivalent — see DESIGN.md § Substitutions.
  */
object Pools {

  val FirstNames: IndexedSeq[String] = IndexedSeq(
    "john", "mary", "james", "patricia", "robert", "jennifer", "michael", "linda",
    "william", "elizabeth", "david", "barbara", "richard", "susan", "joseph", "jessica",
    "thomas", "sarah", "charles", "karen", "christopher", "nancy", "daniel", "lisa",
    "matthew", "betty", "anthony", "margaret", "mark", "sandra", "donald", "ashley",
    "steven", "kimberly", "paul", "emily", "andrew", "donna", "joshua", "michelle")

  val LastNames: IndexedSeq[String] = IndexedSeq(
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller", "davis",
    "rodriguez", "martinez", "hernandez", "lopez", "gonzalez", "wilson", "anderson",
    "thomas", "taylor", "moore", "jackson", "martin", "lee", "perez", "thompson",
    "white", "harris", "sanchez", "clark", "ramirez", "lewis", "robinson", "walker",
    "young", "allen", "king", "wright", "scott", "torres", "nguyen", "hill", "flores")

  /** (city, state, county) triples; zip derived from the index. */
  val Cities: IndexedSeq[(String, String, String)] = IndexedSeq(
    ("birmingham", "al", "jefferson"), ("sylacauga", "al", "talladega"),
    ("anchorage", "ak", "anchorage"), ("phoenix", "az", "maricopa"),
    ("little rock", "ar", "pulaski"), ("sacramento", "ca", "sacramento"),
    ("fresno", "ca", "fresno"), ("denver", "co", "denver"),
    ("hartford", "ct", "hartford"), ("dover", "de", "kent"),
    ("tampa", "fl", "hillsborough"), ("atlanta", "ga", "fulton"),
    ("boise", "id", "ada"), ("chicago", "il", "cook"),
    ("indianapolis", "in", "marion"), ("des moines", "ia", "polk"),
    ("wichita", "ks", "sedgwick"), ("louisville", "ky", "jefferson"),
    ("new orleans", "la", "orleans"), ("portland", "me", "cumberland"),
    ("baltimore", "md", "baltimore"), ("boston", "ma", "suffolk"),
    ("detroit", "mi", "wayne"), ("saint paul", "mn", "ramsey"),
    ("jackson", "ms", "hinds"), ("kansas city", "mo", "jackson"),
    ("billings", "mt", "yellowstone"), ("omaha", "ne", "douglas"),
    ("reno", "nv", "washoe"), ("concord", "nh", "merrimack"),
    ("newark", "nj", "essex"), ("santa fe", "nm", "santa fe"),
    ("albany", "ny", "albany"), ("charlotte", "nc", "mecklenburg"),
    ("fargo", "nd", "cass"), ("columbus", "oh", "franklin"),
    ("tulsa", "ok", "tulsa"), ("salem", "or", "marion"),
    ("pittsburgh", "pa", "allegheny"), ("providence", "ri", "providence"))

  val Streets: IndexedSeq[String] = IndexedSeq(
    "hickory st", "northwood dr", "main st", "oak ave", "maple rd", "cedar ln",
    "elm st", "pine ave", "walnut blvd", "chestnut ct", "willow way", "birch dr",
    "ash st", "poplar ave", "sycamore ln", "magnolia blvd", "juniper rd", "laurel st",
    "hawthorn dr", "dogwood cir")

  val Conditions: IndexedSeq[String] = IndexedSeq(
    "heart attack", "heart failure", "pneumonia", "surgical infection prevention",
    "children asthma care", "stroke care", "sepsis care", "hip replacement")

  val Positions: IndexedSeq[String] = IndexedSeq(
    "goalkeeper", "right back", "left back", "centre back", "sweeper",
    "defensive midfield", "central midfield", "attacking midfield",
    "right wing", "left wing", "centre forward", "striker")

  val Nations: IndexedSeq[String] = IndexedSeq(
    "england", "spain", "germany", "italy", "france", "brazil", "argentina",
    "portugal", "netherlands", "belgium", "croatia", "uruguay", "mexico",
    "japan", "nigeria", "ghana", "senegal", "sweden", "denmark", "poland")

  val BeerStyles: IndexedSeq[String] = IndexedSeq(
    "american ipa", "american pale ale", "american amber ale", "american blonde ale",
    "american double ipa", "american porter", "american stout", "witbier", "hefeweizen",
    "saison farmhouse ale", "fruit beer", "american brown ale", "kolsch", "pilsner",
    "oatmeal stout", "scotch ale")

  val BeerAdjectives: IndexedSeq[String] = IndexedSeq(
    "hoppy", "golden", "amber", "dark", "wild", "lazy", "crooked", "broken",
    "rusty", "noble", "raging", "silent", "burning", "frozen", "iron", "copper")

  val BeerNouns: IndexedSeq[String] = IndexedSeq(
    "river", "mountain", "trail", "anchor", "bear", "eagle", "wolf", "bison",
    "canyon", "harbor", "prairie", "summit", "valley", "lighthouse", "mill", "forge")

  val HospitalTypes: IndexedSeq[String] = IndexedSeq(
    "acute care hospitals", "critical access hospitals", "childrens hospitals")

  val Owners: IndexedSeq[String] = IndexedSeq(
    "government - state", "government - federal", "voluntary non-profit - private",
    "voluntary non-profit - church", "proprietary")

  val FacilityTypes: IndexedSeq[String] = IndexedSeq(
    "nursing home", "home health agency", "hospice", "dialysis facility",
    "rehabilitation center", "long term care")

  val Carriers: IndexedSeq[String] = IndexedSeq("aa", "ua", "dl", "wn", "b6", "as", "nk", "f9")

  val Airports: IndexedSeq[String] = IndexedSeq(
    "atl", "lax", "ord", "dfw", "den", "jfk", "sfo", "sea", "las", "mco",
    "clt", "phx", "mia", "iah", "bos")

  val Websites: IndexedSeq[String] = IndexedSeq(
    "aa", "flightview", "flightaware", "orbitz", "travelocity", "expedia",
    "flightexplorer", "flightwise", "gofox", "ifly", "mytrip", "flightstats",
    "quicktrip", "allegiantair", "panynj", "wunderground", "ontimeflight",
    "worldflightinfo", "flytecomm", "airtravelcenter", "myrateplan", "helloflight",
    "mia-airport", "flightarrivals", "dfw-airport", "iad-airport", "boston-airport",
    "den-airport", "phl-airport", "foxbusiness")

  /** zip derived from a city index — keeps ZipCode → City/State functional. */
  def zip(cityIdx: Int): String = f"${10001 + cityIdx * 2137 % 89000}%05d"

  /** 10-digit phone derived from an entity index. */
  def phone(i: Int): String = f"${2005550000L + i * 7919L % 7999999999L}%010d"

  /** splitmix64 — deterministic per-cell RNG seeding. */
  def mix(a: Long, b: Long): Long = {
    var z = a ^ (b * 0x9e3779b97f4a7c15L)
    z = (z ^ (z >>> 30)) * 0xbf58476d1ce4e5b9L
    z = (z ^ (z >>> 27)) * 0x94d049bb133111ebL
    z ^ (z >>> 31)
  }
}
