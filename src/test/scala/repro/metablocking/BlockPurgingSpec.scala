package repro.metablocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.blocking.{Candidates, StandardBlocking}
import repro.core.Encodings
import repro.data.PersonGen

class BlockPurgingSpec extends SparkSpec {
  import spark.implicits._

  private def keyed(party: Int, n: Int, corr: Double = 0.0) =
    Encodings.withSoundexKey(
      PersonGen.database(spark, party, 0, n, corr, seed = 51L),
      Seq("fname"), "purge-secret")

  test("purgedKeys flags only oversized blocks") {
    val a = Seq((1L, "big"), (2L, "big"), (3L, "small")).toDF("rec_id", "bkey")
    val b = Seq((10L, "big"), (20L, "big"), (30L, "small")).toDF("rec_id", "bkey")
    val bad = BlockPurging.purgedKeys(a, b, "bkey", maxComparisons = 3)
      .collect().map(_.getString(0)).toSet
    assert(bad == Set("big")) // 2*2=4 > 3; small is 1*1
  }
  test("candidates drop pairs from purged blocks only") {
    val a = Seq((1L, "big"), (2L, "big"), (3L, "small")).toDF("rec_id", "bkey")
    val b = Seq((10L, "big"), (20L, "big"), (30L, "small")).toDF("rec_id", "bkey")
    val got = BlockPurging.candidates(a, b, "bkey", maxComparisons = 3)
      .collect().map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(got == Set((3L, 30L)))
  }
  test("huge budget purges nothing") {
    val a = keyed(1, 200); val b = keyed(2, 200)
    val full = StandardBlocking.candidates(a, b, "bkey").count()
    val kept = BlockPurging.candidates(a, b, "bkey", Long.MaxValue / 4).count()
    assert(kept == full)
  }
  test("zero budget purges everything") {
    val a = keyed(1, 100); val b = keyed(2, 100)
    assert(BlockPurging.candidates(a, b, "bkey", 0L).count() == 0)
  }
  test("purging reduces comparisons more than completeness") {
    val a = keyed(1, 600)
    val b = keyed(2, 600, corr = 0.2)
    val truth = PersonGen.truthPairs(a, b)
    val full = StandardBlocking.candidates(a, b, "bkey")
    val purged = BlockPurging.candidates(a, b, "bkey", maxComparisons = 2000)
    val dropRatio = 1.0 - purged.count().toDouble / full.count()
    val pcFull = Candidates.pairsCompleteness(full, truth)
    val pcPurged = Candidates.pairsCompleteness(purged, truth)
    assert(dropRatio > 0.3, s"dropped only ${dropRatio}")
    assert(pcFull - pcPurged < dropRatio, "purging should be comparison-efficient")
  }
  test("oracle: purged candidate set equals DuckDB HAVING query") {
    val a = keyed(1, 150)
    val b = keyed(2, 150, corr = 0.3)
    val sparkOut = BlockPurging.candidates(a, b, "bkey", maxComparisons = 40)
      .select(col("id_a").cast("string") as "id_a", col("id_b").cast("string") as "id_b")
    Oracle.assertEquivalent(sparkOut,
      """WITH sizes AS (
        |  SELECT ka.bkey, ka.n * kb.n AS cmp FROM
        |    (SELECT bkey, COUNT(*) n FROM a GROUP BY bkey) ka JOIN
        |    (SELECT bkey, COUNT(*) n FROM b GROUP BY bkey) kb USING (bkey)
        |)
        |SELECT DISTINCT a.rec_id AS id_a, b.rec_id AS id_b
        |FROM a JOIN b USING (bkey)
        |WHERE a.bkey NOT IN (SELECT bkey FROM sizes WHERE cmp > 40)""".stripMargin,
      "a" -> a.select("rec_id", "bkey"), "b" -> b.select("rec_id", "bkey"))
  }
}
