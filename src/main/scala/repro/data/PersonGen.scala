package repro.data

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Hashing

/** A person record as held by one database owner. `rec_id` is globally
  * unique (`partyTag * 10^9 + ent_id`); `ent_id` identifies the underlying
  * real-world entity and exists only as evaluation ground truth — no
  * protocol step may join on it.
  */
case class Person(rec_id: Long, ent_id: Long, fname: String, lname: String,
                  dob: String, gender: String, city: String, phone: String)

/** Synthetic identity databases with controlled overlap and corruption —
  * the offline stand-in for NCVR / GeCo corpora (see DESIGN.md §1).
  *
  * Every attribute of entity `e` is a pure function of `(e, seed)`
  * (splitmix64 + Zipf inverse-CDF), so all parties regenerate identical
  * truth attributes independently; corruption is then applied per party
  * with a party-specific salt. Determinism also means the DuckDB oracle
  * sees byte-identical inputs.
  */
object PersonGen {

  private lazy val cdfFirst = Names.zipfCdf(Names.FirstNames.size, 1.0)
  private lazy val cdfLast  = Names.zipfCdf(Names.LastNames.size, 0.9)
  private lazy val cdfCity  = Names.zipfCdf(Names.Cities.size, 0.8)

  /** Ground-truth attributes of entity `entId` under generator `seed`. */
  def entityAttrs(entId: Long, seed: Long)
      : (String, String, String, String, String, String) = {
    val f = Names.pick(Names.FirstNames, cdfFirst, Hashing.hash01(entId, seed ^ 1L))
    val l = Names.pick(Names.LastNames, cdfLast, Hashing.hash01(entId, seed ^ 2L))
    val year  = 1930 + Hashing.hashInt(entId, seed ^ 3L, 75)
    val month = 1 + Hashing.hashInt(entId, seed ^ 4L, 12)
    val day   = 1 + Hashing.hashInt(entId, seed ^ 5L, 28)
    val dob = f"$year%04d$month%02d$day%02d"
    val g = if (Hashing.hash01(entId, seed ^ 6L) < 0.5) "m" else "f"
    val c = Names.pick(Names.Cities, cdfCity, Hashing.hash01(entId, seed ^ 7L))
    val ph = f"${math.floorMod(Hashing.mix(entId, seed ^ 8L), 100000000L)}%08d"
    (f, l, dob, g, c, ph)
  }

  /** Build one party's record for entity `entId` (corruption applied). */
  def record(entId: Long, partyTag: Int, seed: Long,
             corruptionRate: Double, maxEdits: Int): Person = {
    val (f, l, dob, g, c, ph) = entityAttrs(entId, seed)
    val salt = Hashing.mix(seed, 0x700L + partyTag)
    val (f2, l2, d2, c2) =
      Corruptor.corruptRecord(f, l, dob, c, entId, salt, corruptionRate, maxEdits)
    Person(partyTag.toLong * 1000000000L + entId, entId, f2, l2, d2, g, c2, ph)
  }

  /** A database holding records for the given contiguous entity range. */
  def database(spark: SparkSession, partyTag: Int, entFrom: Long, entUntil: Long,
               corruptionRate: Double = 0.0, maxEdits: Int = 2,
               seed: Long = 42L): DataFrame = {
    import spark.implicits._
    val gen = udf((e: Long) => record(e, partyTag, seed, corruptionRate, maxEdits))
    spark.range(entFrom, entUntil).select(gen($"id") as "p").select("p.*")
  }

  /** The classic two-party setting: Alice holds entities [0, nA) clean,
    * Bob holds entities [nA-overlap, nA-overlap+nB) with `corruptionRate`
    * of his records corrupted — so exactly `overlap` entities appear in
    * both databases and corrupted matches exercise fuzzy similarity.
    */
  def pair(spark: SparkSession, nA: Long, nB: Long, overlap: Long,
           corruptionRate: Double = 0.2, maxEdits: Int = 2, seed: Long = 42L)
      : (DataFrame, DataFrame) = {
    require(overlap <= nA && overlap <= nB,
      s"overlap $overlap exceeds a database size ($nA, $nB)")
    val a = database(spark, 1, 0L, nA, 0.0, maxEdits, seed)
    val b = database(spark, 2, nA - overlap, nA - overlap + nB,
                     corruptionRate, maxEdits, seed)
    (a, b)
  }

  /** Multi-party setting: `p` parties over an entity universe of size
    * `universe`; party i holds entity e iff hash01(e, ·) < inclusionProb.
    * All parties corrupt independently. Returns one DataFrame per party.
    */
  def parties(spark: SparkSession, p: Int, universe: Long,
              inclusionProb: Double, corruptionRate: Double = 0.2,
              maxEdits: Int = 2, seed: Long = 42L): Seq[DataFrame] = {
    require(p >= 2, s"need >= 2 parties, got $p")
    import spark.implicits._
    (1 to p).map { tag =>
      val keep = udf((e: Long) =>
        Hashing.hash01(e, Hashing.mix(seed, 0xbeef00L + tag)) < inclusionProb)
      val gen = udf((e: Long) => record(e, tag, seed, corruptionRate, maxEdits))
      spark.range(0L, universe).filter(keep($"id"))
        .select(gen($"id") as "p").select("p.*")
    }
  }

  /** Ground-truth matching pairs between two parties: `(id_a, id_b)` for
    * records of the same entity. Evaluation-only.
    */
  def truthPairs(a: DataFrame, b: DataFrame): DataFrame = {
    a.select(col("rec_id") as "id_a", col("ent_id"))
      .join(b.select(col("rec_id") as "id_b", col("ent_id")), "ent_id")
      .select("id_a", "id_b")
  }
}
