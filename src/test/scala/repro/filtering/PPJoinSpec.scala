package repro.filtering

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.{BloomFilter, Encodings, Hashing, QGrams}
import repro.data.PersonGen

class PPJoinSpec extends SparkSpec {
  import spark.implicits._

  test("diceToJaccard known conversions") {
    assert(math.abs(PPJoin.diceToJaccard(0.8) - 2.0 / 3) < 1e-12)
    assert(PPJoin.diceToJaccard(1.0) == 1.0)
    assert(math.abs(PPJoin.diceToJaccard(0.5) - 1.0 / 3) < 1e-12)
  }

  test("bfPositions column matches kernel setPositions") {
    val df = Encodings.withClk(PersonGen.database(spark, 1, 0, 10),
                               Seq("fname"), l = 128, k = 5)
    val rows = df.select(col("bf"), PPJoin.bfPositions(col("bf")) as "pos").collect()
    rows.foreach { r =>
      assert(r.getSeq[Int](1) == BloomFilter.setPositions(r.getAs[Array[Byte]](0)))
    }
  }

  private def tok(pairs: (Long, Seq[Int])*) = pairs.toDF("id", "tokens")

  test("rankTokens orders by ascending document frequency") {
    val a = tok(1L -> Seq(100, 200), 2L -> Seq(100))
    val b = tok(10L -> Seq(100, 300))
    val (ar, _) = PPJoin.rankTokens(a, b)
    // df: 100→3, 200→1, 300→1 ⇒ rarest first: 200/300 get low ranks, 100 highest
    val toksOf1 = ar.where(col("id") === 1L).head.getSeq[Int](1)
    assert(toksOf1.size == 2)
    assert(toksOf1.last == 3, s"common token should rank last: $toksOf1") // 100 is most frequent
  }
  test("rankTokens preserves set sizes") {
    val a = tok(1L -> Seq(1, 2, 3), 2L -> Seq(2, 3))
    val b = tok(10L -> Seq(3, 4))
    val (ar, br) = PPJoin.rankTokens(a, b)
    assert(ar.where(col("id") === 1L).head.getSeq[Int](1).size == 3)
    assert(br.head.getSeq[Int](1).size == 2)
  }

  test("prefixLen column formula") {
    // |x|-ceil(t|x|)+1: n=4 → 4-3+1=2; n=10 → 10-8+1=3
    val df = Seq(4, 10).toDF("n")
    val vals = df.select(col("n"), PPJoin.prefixLen(col("n"), 0.75) as "p").orderBy("n")
      .collect().map(_.getAs[Number]("p").intValue())
    assert(vals.toSeq == Seq(2, 3))
  }

  test("candidates retain all pairs above threshold (no false dismissals)") {
    // random small universe; brute-force verify against candidates
    val rnd = new scala.util.Random(7)
    def randSet() = (0 until (5 + rnd.nextInt(10))).map(_ => rnd.nextInt(40)).distinct
    val aSets = (1L to 30L).map(i => i -> randSet())
    val bSets = (101L to 130L).map(i => i -> randSet())
    val t = 0.5
    val (ar, br) = PPJoin.rankTokens(tok(aSets: _*), tok(bSets: _*))
    val cand = PPJoin.candidates(ar, br, t).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    for ((ia, sa) <- aSets; (ib, sb) <- bSets) {
      val j = sa.toSet.intersect(sb.toSet).size.toDouble / sa.toSet.union(sb.toSet).size
      if (j >= t) assert(cand.contains((ia, ib)), s"missed pair $ia-$ib with jaccard $j")
    }
  }
  test("candidates prune pairs that cannot reach the threshold") {
    val a = tok(1L -> Seq(1, 2, 3, 4, 5, 6, 7, 8, 9, 10))
    val b = tok(10L -> Seq(11, 12), 20L -> Seq(1, 2, 3, 4, 5, 6, 7, 8, 9))
    val (ar, br) = PPJoin.rankTokens(a, b)
    val cand = PPJoin.candidates(ar, br, 0.8).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(!cand.contains((1L, 10L))) // length filter: 2 < 0.8*10
    assert(cand.contains((1L, 20L)))
  }
  test("verify computes exact jaccard and filters") {
    val a = tok(1L -> Seq(1, 2, 3, 4))
    val b = tok(10L -> Seq(1, 2, 3, 9), 20L -> Seq(1, 9, 8, 7))
    val (ar, br) = PPJoin.rankTokens(a, b)
    val cand = PPJoin.candidates(ar, br, 0.5)
    val ver = PPJoin.verify(cand, ar, br, 0.5).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    assert(math.abs(ver((1L, 10L)) - 3.0 / 5) < 1e-12)
    assert(!ver.contains((1L, 20L))) // jaccard 1/7 < 0.5
  }
  test("verified results equal brute force exactly") {
    val rnd = new scala.util.Random(13)
    def randSet() = (0 until (4 + rnd.nextInt(8))).map(_ => rnd.nextInt(30)).distinct
    val aSets = (1L to 25L).map(i => i -> randSet())
    val bSets = (101L to 125L).map(i => i -> randSet())
    val t = 0.4
    val (ar, br) = PPJoin.rankTokens(tok(aSets: _*), tok(bSets: _*))
    val got = PPJoin.verify(PPJoin.candidates(ar, br, t), ar, br, t).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    val expected = (for {
      (ia, sa) <- aSets; (ib, sb) <- bSets
      j = sa.toSet.intersect(sb.toSet).size.toDouble / sa.toSet.union(sb.toSet).size
      if j >= t
    } yield (ia, ib)).toSet
    assert(got == expected)
  }
  test("threshold must be in (0,1]") {
    val (ar, br) = PPJoin.rankTokens(tok(1L -> Seq(1)), tok(2L -> Seq(1)))
    assertThrows[IllegalArgumentException](PPJoin.candidates(ar, br, 0.0))
    assertThrows[IllegalArgumentException](PPJoin.candidates(ar, br, 1.5))
  }
  test("lengthFilter bounds") {
    val pairs = Seq((1L, 2L, 10, 4), (1L, 3L, 10, 8), (1L, 4L, 10, 21))
      .toDF("id_a", "id_b", "len_a", "len_b")
    val kept = PPJoin.lengthFilter(pairs, "len_a", "len_b", 0.5).collect()
      .map(_.getLong(1)).toSet
    assert(kept == Set(3L)) // 4 < 5 fails; 8 in [5,20] ok; 21 > 20 fails
  }
  test("ppjoin on BF positions agrees with BF jaccard") {
    val df1 = Encodings.withClk(PersonGen.database(spark, 1, 0, 15),
                                Seq("fname", "lname"), l = 256, k = 8)
    val df2 = Encodings.withClk(PersonGen.database(spark, 2, 0, 15, 0.3, seed = 42L),
                                Seq("fname", "lname"), l = 256, k = 8)
    val a = df1.select(col("rec_id") as "id", PPJoin.bfPositions(col("bf")) as "tokens")
    val b = df2.select(col("rec_id") as "id", PPJoin.bfPositions(col("bf")) as "tokens")
    val (ar, br) = PPJoin.rankTokens(a, b)
    val ver = PPJoin.verify(PPJoin.candidates(ar, br, 0.6), ar, br, 0.6)
    // compare against direct BF jaccard cross product
    val direct = df1.select(col("rec_id") as "id_a", col("bf") as "bf_a")
      .crossJoin(df2.select(col("rec_id") as "id_b", col("bf") as "bf_b"))
      .collect()
      .filter(r => BloomFilter.jaccard(r.getAs[Array[Byte]](1), r.getAs[Array[Byte]](3)) >= 0.6)
      .map(r => (r.getLong(0), r.getLong(2))).toSet
    assert(ver.collect().map(r => (r.getLong(0), r.getLong(1))).toSet == direct)
  }
  test("oracle: verified jaccard equals DuckDB set computation") {
    val aSets = Seq(1L -> Seq(1, 2, 3, 4), 2L -> Seq(2, 3, 4, 5, 6))
    val bSets = Seq(10L -> Seq(1, 2, 3, 9), 20L -> Seq(4, 5, 6, 7))
    val (ar, br) = PPJoin.rankTokens(tok(aSets: _*), tok(bSets: _*))
    val sparkOut = PPJoin.verify(PPJoin.candidates(ar, br, 0.3), ar, br, 0.3)
      .select(col("id_a").cast("string") as "id_a",
              col("id_b").cast("string") as "id_b",
              col("jaccard") as "jaccard")
    val aTok = tok(aSets: _*).select(col("id"), explode(col("tokens")) as "tok")
      .select(col("id").cast("string") as "id", col("tok").cast("string") as "tok")
    val bTok = tok(bSets: _*).select(col("id"), explode(col("tokens")) as "tok")
      .select(col("id").cast("string") as "id", col("tok").cast("string") as "tok")
    Oracle.assertEquivalent(sparkOut,
      """WITH inter AS (
        |  SELECT a.id ia, b.id ib, COUNT(*) c
        |  FROM a JOIN b ON a.tok = b.tok GROUP BY a.id, b.id
        |), ca AS (SELECT id, COUNT(*) n FROM a GROUP BY id),
        |   cb AS (SELECT id, COUNT(*) n FROM b GROUP BY id)
        |SELECT ia AS id_a, ib AS id_b,
        |       CAST(c AS DOUBLE) / (ca.n + cb.n - c) AS jaccard
        |FROM inter JOIN ca ON ca.id = ia JOIN cb ON cb.id = ib
        |WHERE CAST(c AS DOUBLE) / (ca.n + cb.n - c) >= 0.3""".stripMargin,
      "a" -> aTok, "b" -> bTok)
  }
}
