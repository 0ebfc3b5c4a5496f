package repro.data

import scala.util.Random

/** Value pools for the synthetic dirty datasets. Mirrors febrl's
  * frequency-table-driven generation (paper §9.1): realistic names and
  * places for people/organisations, pseudo-vocabulary for paper titles
  * sized so that token-block sizes stay proportional to the paper's
  * datasets at 1/100 scale.
  */
object Pools {

  val FirstNames: Array[String] = Array(
    "james", "mary", "john", "patricia", "robert", "jennifer", "michael", "linda",
    "william", "elizabeth", "david", "barbara", "richard", "susan", "joseph", "jessica",
    "thomas", "sarah", "charles", "karen", "christopher", "nancy", "daniel", "lisa",
    "matthew", "betty", "anthony", "margaret", "mark", "sandra", "donald", "ashley",
    "steven", "kimberly", "paul", "emily", "andrew", "donna", "joshua", "michelle",
    "kenneth", "dorothy", "kevin", "carol", "brian", "amanda", "george", "melissa",
    "edward", "deborah", "ronald", "stephanie", "timothy", "rebecca", "jason", "sharon",
    "jeffrey", "laura", "ryan", "cynthia", "jacob", "kathleen", "gary", "amy",
    "nicholas", "shirley", "eric", "angela", "jonathan", "helen", "stephen", "anna",
    "larry", "brenda", "justin", "pamela", "scott", "nicole", "brandon", "emma",
    "benjamin", "samantha", "samuel", "katherine", "gregory", "christine", "frank", "debra",
    "alexander", "rachel", "raymond", "catherine", "patrick", "carolyn", "jack", "janet",
    "dennis", "ruth", "jerry", "maria", "tyler", "heather", "aaron", "diane",
    "jose", "virginia", "adam", "julie", "henry", "joyce", "nathan", "victoria",
    "douglas", "olivia", "zachary", "kelly", "peter", "christina", "kyle", "lauren",
  )

  val LastNames: Array[String] = Array(
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller", "davis",
    "rodriguez", "martinez", "hernandez", "lopez", "gonzalez", "wilson", "anderson", "thomas",
    "taylor", "moore", "jackson", "martin", "lee", "perez", "thompson", "white",
    "harris", "sanchez", "clark", "ramirez", "lewis", "robinson", "walker", "young",
    "allen", "king", "wright", "scott", "torres", "nguyen", "hill", "flores",
    "green", "adams", "nelson", "baker", "hall", "rivera", "campbell", "mitchell",
    "carter", "roberts", "gomez", "phillips", "evans", "turner", "diaz", "parker",
    "cruz", "edwards", "collins", "reyes", "stewart", "morris", "morales", "murphy",
    "cook", "rogers", "gutierrez", "ortiz", "morgan", "cooper", "peterson", "bailey",
    "reed", "kelly", "howard", "ramos", "kim", "cox", "ward", "richardson",
    "watson", "brooks", "chavez", "wood", "james", "bennett", "gray", "mendoza",
    "ruiz", "hughes", "price", "alvarez", "castillo", "sanders", "patel", "myers",
    "long", "ross", "foster", "jimenez", "powell", "jenkins", "perry", "russell",
    "sullivan", "bell", "coleman", "butler", "henderson", "barnes", "fisher", "vasquez",
    "simmons", "porter", "graham", "wallace", "stevens", "berger", "muller", "keller",
    "hoffmann", "schneider", "fischer", "weber", "wagner", "becker", "schulz", "richter",
    "koch", "bauer", "klein", "wolf", "neumann", "schwarz", "zimmermann", "krause",
    "meier", "lehmann", "huber", "mayer", "fuchs", "weiss", "peters", "lang",
    "scholz", "moller", "jung", "hahn", "vogel", "friedrich", "gunther", "berg",
    "winkler", "lorenz", "baumann", "schmitt", "albrecht", "ludwig", "heinrich", "otto",
  )

  val Streets: Array[String] = Array(
    "main street", "oak avenue", "park road", "maple drive", "cedar lane", "elm street",
    "pine road", "hill street", "river road", "lake avenue", "church street", "mill lane",
    "high street", "station road", "green lane", "kings road", "queens avenue", "bridge street",
    "forest drive", "meadow lane", "spring street", "sunset boulevard", "valley road", "ridge avenue",
    "chestnut street", "willow way", "birch road", "hazel grove", "holly drive", "ivy lane",
    "juniper court", "laurel street", "magnolia avenue", "poplar road", "sycamore drive", "walnut street",
    "acacia avenue", "beech road", "cherry lane", "dogwood drive", "fir street", "garden road",
    "harbor view", "island drive", "junction road", "kingfisher way", "lilac close", "marsh lane",
  )

  val Cities: Array[String] = Array(
    "springfield", "riverton", "fairview", "kingston", "bristol", "georgetown", "salem",
    "madison", "clinton", "arlington", "ashland", "burlington", "manchester", "milton",
    "newport", "oxford", "clayton", "dayton", "lexington", "milford", "auburn", "dover",
    "hudson", "chester", "franklin", "greenville", "marion", "winchester", "jackson",
    "lancaster", "dublin", "athens", "florence", "geneva", "hamburg", "lisbon", "oslo",
    "berlin", "vienna", "prague", "warsaw", "zurich", "naples", "turin", "porto",
    "granada", "seville", "valencia", "bergen", "malmo", "aarhus", "ghent", "leuven",
    "utrecht", "leiden", "delft", "uppsala", "lund", "tampere", "espoo", "graz",
  )

  val States: Array[String] = Array(
    "alabama", "alaska", "arizona", "arkansas", "california", "colorado", "connecticut",
    "delaware", "florida", "georgia", "hawaii", "idaho", "illinois", "indiana", "iowa",
    "kansas", "kentucky", "louisiana", "maine", "maryland", "massachusetts", "michigan",
    "minnesota", "mississippi", "missouri",
  )

  val Occupations: Array[String] = Array(
    "engineer", "teacher", "nurse", "accountant", "architect", "chemist", "dentist",
    "economist", "electrician", "farmer", "journalist", "lawyer", "librarian", "mechanic",
    "musician", "pharmacist", "photographer", "physician", "pilot", "plumber", "professor",
    "programmer", "psychologist", "scientist", "surveyor", "translator", "veterinarian",
    "waiter", "welder", "writer", "analyst", "designer", "consultant", "technician",
  )

  val Countries: Array[String] = Array(
    "greece", "germany", "france", "italy", "spain", "portugal", "netherlands", "belgium",
    "austria", "sweden", "denmark", "norway", "finland", "ireland", "poland", "czechia",
    "hungary", "romania", "bulgaria", "croatia", "slovenia", "slovakia", "estonia", "latvia",
    "lithuania", "luxembourg", "malta", "cyprus",
  )

  val Funders: Array[String] = Array(
    "european commission", "national science foundation", "wellcome trust", "horizon europe",
    "research council", "royal society", "max planck society", "cnrs", "dfg", "elidek",
    "gsrt", "academy of finland", "swiss nsf", "austrian fwf", "dutch nwo", "swedish vr",
  )

  val Publishers: Array[String] = Array(
    "acm", "ieee", "springer", "elsevier", "wiley", "mit press", "oxford university press",
    "cambridge university press", "morgan kaufmann", "vldb endowment", "usenix", "now publishers",
  )

  val Languages: Array[String] = Array(
    "english", "german", "french", "greek", "spanish", "italian", "portuguese", "dutch",
  )

  val Fields: Array[String] = Array(
    "databases", "machine learning", "information retrieval", "data mining", "distributed systems",
    "computer vision", "natural language processing", "security", "networking", "theory",
    "human computer interaction", "software engineering", "bioinformatics", "graphics", "robotics",
  )

  val DocTypes: Array[String] = Array(
    "article", "inproceedings", "incollection", "phdthesis", "techreport", "book",
  )

  val Sources: Array[String] = Array("mag", "aminer", "dblp", "scholar", "crossref", "core")

  val VenueTopics: Array[String] = Array(
    "extending database technology", "management of data", "very large data bases",
    "data engineering", "information and knowledge management", "web search and data mining",
    "machine learning", "artificial intelligence", "knowledge discovery and data mining",
    "innovative data systems research", "distributed computing", "parallel processing",
    "computer vision and pattern recognition", "neural information processing",
    "computational linguistics", "software engineering", "operating systems",
    "computer architecture", "programming language design", "information retrieval",
    "semantic web", "cloud computing", "big data analytics", "data integration",
    "entity resolution", "stream processing", "graph data management", "spatial databases",
    "temporal reasoning", "uncertainty in databases", "scientific data management",
    "privacy enhancing technologies", "network security", "human computation",
    "recommender systems", "social network analysis", "digital libraries",
    "information visualization", "high performance computing", "embedded systems",
  )

  /** Pseudo-vocabulary generator: `n` distinct pronounceable words, sized
    * to keep title-token block sizes proportional to the paper's corpora.
    */
  def wordPool(n: Int, seed: Long = 17L): Array[String] = {
    val onset  = Array("b", "br", "c", "cr", "d", "dr", "f", "fl", "g", "gr", "h", "k",
      "l", "m", "n", "p", "pr", "qu", "r", "s", "st", "t", "tr", "v", "w", "z", "sch", "th")
    val nucleus = Array("a", "e", "i", "o", "u", "ai", "ea", "io", "ou")
    val coda   = Array("", "n", "r", "s", "t", "l", "m", "x", "nd", "rk", "st")
    val rng    = new Random(seed)
    val seen   = scala.collection.mutable.LinkedHashSet.empty[String]
    while (seen.size < n) {
      val syllables = 2 + rng.nextInt(2)
      val sb = new StringBuilder
      for (_ <- 0 until syllables)
        sb.append(onset(rng.nextInt(onset.length)))
          .append(nucleus(rng.nextInt(nucleus.length)))
          .append(coda(rng.nextInt(coda.length)))
      val w = sb.toString
      if (w.length >= 4) seen += w
    }
    seen.toArray
  }
}
