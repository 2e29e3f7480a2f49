package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Encodings
import repro.data.PersonGen

class StandardBlockingSpec extends SparkSpec {

  private def keyed(party: Int, n: Int, corr: Double = 0.0) =
    Encodings.withSoundexKey(
      PersonGen.database(spark, party, 0, n, corr, seed = 21L),
      Seq("fname", "lname"), "blk-secret")

  test("keys selects id and key") {
    val k = StandardBlocking.keys(keyed(1, 10), "bkey")
    assert(k.columns.toSeq == Seq("id", "key"))
    assert(k.count() == 10)
  }
  test("keys drops null keys") {
    import spark.implicits._
    val df = Seq((1L, "k"), (2L, null)).toDF("rec_id", "bkey")
    assert(StandardBlocking.keys(df, "bkey").count() == 1)
  }
  test("clean identical parties: candidates include all true pairs") {
    val a = keyed(1, 80)
    val b = keyed(2, 80)
    val cand = StandardBlocking.candidates(a, b, "bkey")
    val truth = PersonGen.truthPairs(a, b)
    assert(Candidates.pairsCompleteness(cand, truth) == 1.0)
  }
  test("candidates never exceed cross product and beat it substantially") {
    val a = keyed(1, 200); val b = keyed(2, 200)
    val n = StandardBlocking.candidates(a, b, "bkey").count()
    assert(n < 200L * 200L / 4, s"blocking produced $n of 40000 pairs")
    assert(n > 0)
  }
  test("corruption loses some pairs (the soundex weakness)") {
    val a = keyed(1, 400)
    val b = keyed(2, 400, corr = 0.6)
    val pc = Candidates.pairsCompleteness(
      StandardBlocking.candidates(a, b, "bkey"), PersonGen.truthPairs(a, b))
    assert(pc < 1.0, "corruption should break some phonetic keys")
    assert(pc > 0.5, "most records survive")
  }
  test("pairs join only within equal keys") {
    import spark.implicits._
    val a = Seq((1L, "x"), (2L, "y")).toDF("rec_id", "bkey")
    val b = Seq((10L, "x"), (20L, "z")).toDF("rec_id", "bkey")
    val got = StandardBlocking.candidates(a, b, "bkey").collect()
    assert(got.map(r => (r.getLong(0), r.getLong(1))).toSet == Set((1L, 10L)))
  }
  test("oracle: candidates equal DuckDB equi-join") {
    val a = keyed(1, 150)
    val b = keyed(2, 150, corr = 0.3)
    val sparkOut = StandardBlocking.candidates(a, b, "bkey")
      .select(col("id_a").cast("string") as "id_a", col("id_b").cast("string") as "id_b")
    Oracle.assertEquivalent(sparkOut,
      """SELECT DISTINCT a.rec_id AS id_a, b.rec_id AS id_b
        |FROM a JOIN b ON a.bkey = b.bkey""".stripMargin,
      "a" -> a.select("rec_id", "bkey"), "b" -> b.select("rec_id", "bkey"))
  }
  test("blockSizes counts per-key membership and comparisons") {
    import spark.implicits._
    val a = Seq((1L, "x"), (2L, "x"), (3L, "y")).toDF("rec_id", "bkey")
    val b = Seq((10L, "x"), (20L, "y"), (30L, "y")).toDF("rec_id", "bkey")
    val m = StandardBlocking.blockSizes(a, b, "bkey").collect()
      .map(r => r.getString(0) -> (r.getLong(1), r.getLong(2), r.getLong(3))).toMap
    assert(m("x") == ((2L, 1L, 2L)))
    assert(m("y") == ((1L, 2L, 2L)))
  }
  test("oracle: blockSizes equal DuckDB group-by join") {
    val a = keyed(1, 120)
    val b = keyed(2, 120, corr = 0.2)
    val sparkOut = StandardBlocking.blockSizes(a, b, "bkey")
      .select(col("key"), col("n_a").cast("long") as "n_a",
              col("n_b").cast("long") as "n_b",
              col("comparisons").cast("long") as "comparisons")
    Oracle.assertEquivalent(sparkOut,
      """SELECT ka.bkey AS key, ka.n n_a, kb.n n_b, ka.n * kb.n AS comparisons
        |FROM (SELECT bkey, COUNT(*) n FROM a GROUP BY bkey) ka
        |JOIN (SELECT bkey, COUNT(*) n FROM b GROUP BY bkey) kb ON ka.bkey = kb.bkey""".stripMargin,
      "a" -> a.select("rec_id", "bkey"), "b" -> b.select("rec_id", "bkey"))
  }
}
