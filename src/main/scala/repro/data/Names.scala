package repro.data

/** Value pools for the synthetic person generator.
  *
  * Real identity data (NCVR, GeCo output) has heavily skewed value
  * frequencies — the property that frequency attacks and blocking skew
  * depend on — so each pool is drawn with Zipf weights over its rank:
  * weight(rank r) = 1 / r^alpha.
  */
object Names {

  val FirstNames: Vector[String] = Vector(
    "james", "mary", "john", "patricia", "robert", "jennifer", "michael",
    "linda", "william", "elizabeth", "david", "barbara", "richard", "susan",
    "joseph", "jessica", "thomas", "sarah", "charles", "karen", "christopher",
    "nancy", "daniel", "lisa", "matthew", "margaret", "anthony", "betty",
    "mark", "sandra", "donald", "ashley", "steven", "dorothy", "paul",
    "kimberly", "andrew", "emily", "joshua", "donna", "kenneth", "michelle",
    "kevin", "carol", "brian", "amanda", "george", "melissa", "edward",
    "deborah", "ronald", "stephanie", "timothy", "rebecca", "jason", "laura",
    "jeffrey", "sharon", "ryan", "cynthia", "jacob", "kathleen", "gary",
    "helen", "nicholas", "amy", "eric", "shirley", "jonathan", "angela",
    "stephen", "anna", "larry", "brenda", "justin", "pamela", "scott",
    "nicole", "brandon", "ruth", "benjamin", "katherine", "samuel",
    "samantha", "gregory", "christine", "alexander", "emma", "frank",
    "catherine", "patrick", "debra", "raymond", "virginia", "jack", "rachel",
    "dennis", "carolyn", "jerry", "janet", "tyler", "maria", "aaron",
    "heather", "jose", "diane", "adam", "julie", "nathan", "joyce", "henry",
    "victoria", "douglas", "kelly", "zachary", "christina", "peter", "joan",
    "kyle", "evelyn",
  )

  val LastNames: Vector[String] = Vector(
    "smith", "johnson", "williams", "brown", "jones", "garcia", "miller",
    "davis", "rodriguez", "martinez", "hernandez", "lopez", "gonzalez",
    "wilson", "anderson", "thomas", "taylor", "moore", "jackson", "martin",
    "lee", "perez", "thompson", "white", "harris", "sanchez", "clark",
    "ramirez", "lewis", "robinson", "walker", "young", "allen", "king",
    "wright", "scott", "torres", "nguyen", "hill", "flores", "green",
    "adams", "nelson", "baker", "hall", "rivera", "campbell", "mitchell",
    "carter", "roberts", "gomez", "phillips", "evans", "turner", "diaz",
    "parker", "cruz", "edwards", "collins", "reyes", "stewart", "morris",
    "morales", "murphy", "cook", "rogers", "gutierrez", "ortiz", "morgan",
    "cooper", "peterson", "bailey", "reed", "kelly", "howard", "ramos",
    "kim", "cox", "ward", "richardson", "watson", "brooks", "chavez",
    "wood", "james", "bennett", "gray", "mendoza", "ruiz", "hughes",
    "price", "alvarez", "castillo", "sanders", "patel", "myers", "long",
    "ross", "foster", "jimenez", "powell", "jenkins", "perry", "russell",
    "sullivan", "bell", "coleman", "butler", "henderson", "barnes",
    "gonzales", "fisher", "vasquez", "simmons", "romero", "jordan",
    "patterson", "alexander", "hamilton", "graham",
  )

  val Cities: Vector[String] = Vector(
    "springfield", "rivertown", "lakeside", "fairview", "georgetown",
    "salem", "madison", "clinton", "franklin", "greenville", "bristol",
    "dover", "hudson", "kingston", "milton", "newport", "oxford",
    "arlington", "ashland", "auburn", "burlington", "camden", "chester",
    "clayton", "dayton", "florence", "jackson", "lebanon", "lexington",
    "manchester", "marion", "monroe", "newton", "oakland", "princeton",
    "richmond", "riverside", "somerset", "troy", "winchester", "york",
    "brighton", "carlisle", "dublin", "easton", "glendale", "hampton",
    "lancaster", "norwood", "westfield",
  )

  /** Cumulative Zipf CDF over `n` ranks with exponent `alpha`. */
  def zipfCdf(n: Int, alpha: Double): Array[Double] = {
    require(n > 0, s"pool must be non-empty, got $n")
    val w = Array.tabulate(n)(i => 1.0 / math.pow(i + 1, alpha))
    val total = w.sum
    val cdf = new Array[Double](n)
    var acc = 0.0
    var i = 0
    while (i < n) { acc += w(i) / total; cdf(i) = acc; i += 1 }
    cdf(n - 1) = 1.0
    cdf
  }

  /** Index in [0, cdf.length) of the first CDF entry >= u (inverse CDF). */
  def zipfIndex(cdf: Array[Double], u: Double): Int = {
    var lo = 0; var hi = cdf.length - 1
    while (lo < hi) {
      val mid = (lo + hi) >>> 1
      if (cdf(mid) >= u) hi = mid else lo = mid + 1
    }
    lo
  }

  /** Zipf-weighted pick from `pool` given uniform u in [0,1). */
  def pick(pool: Vector[String], cdf: Array[Double], u: Double): String =
    pool(zipfIndex(cdf, u))
}
