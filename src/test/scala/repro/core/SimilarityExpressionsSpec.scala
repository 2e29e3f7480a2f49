package repro.core

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.data.PersonGen

class SimilarityExpressionsSpec extends SparkSpec {

  private val secret = "expr-secret"

  private def encoded(n: Int, party: Int) =
    Encodings.withClk(PersonGen.database(spark, party, 0, n,
                        corruptionRate = if (party == 1) 0.0 else 0.5, seed = 11L),
                      Seq("fname", "lname"), l = 256, k = 10, secret = secret)
      .select("rec_id", "bf")

  private def pairs(n: Int) =
    encoded(n, 1).withColumnRenamed("rec_id", "id_a").withColumnRenamed("bf", "bf_a")
      .crossJoin(encoded(n, 2).withColumnRenamed("rec_id", "id_b")
        .withColumnRenamed("bf", "bf_b"))

  test("diceSim column matches the kernel") {
    val rows = pairs(12)
      .select(col("bf_a"), col("bf_b"),
              SimilarityExpressions.diceSim(col("bf_a"), col("bf_b")) as "sim")
      .collect()
    assert(rows.nonEmpty)
    rows.foreach { r =>
      val expected = BloomFilter.dice(r.getAs[Array[Byte]](0), r.getAs[Array[Byte]](1))
      assert(math.abs(r.getDouble(2) - expected) < 1e-12)
    }
  }
  test("jaccardSim column matches the kernel") {
    val rows = pairs(10)
      .select(col("bf_a"), col("bf_b"),
              SimilarityExpressions.jaccardSim(col("bf_a"), col("bf_b")) as "sim")
      .collect()
    rows.foreach { r =>
      val expected = BloomFilter.jaccard(r.getAs[Array[Byte]](0), r.getAs[Array[Byte]](1))
      assert(math.abs(r.getDouble(2) - expected) < 1e-12)
    }
  }
  test("hammingDist column matches the kernel") {
    val rows = pairs(10)
      .select(col("bf_a"), col("bf_b"),
              SimilarityExpressions.hammingDist(col("bf_a"), col("bf_b")) as "h")
      .collect()
    rows.foreach { r =>
      assert(r.getInt(2) ==
        BloomFilter.hamming(r.getAs[Array[Byte]](0), r.getAs[Array[Byte]](1)))
    }
  }
  test("bitCount column matches popcount") {
    val rows = encoded(20, 1)
      .select(col("bf"), SimilarityExpressions.bitCount(col("bf")) as "c").collect()
    rows.foreach(r => assert(r.getInt(1) == BloomFilter.popcount(r.getAs[Array[Byte]](0))))
  }

  test("identical filters give dice=jaccard=1, hamming=0") {
    val df = encoded(8, 1)
    val self = df.withColumnRenamed("bf", "bf_a")
      .join(df.withColumnRenamed("bf", "bf_b"), "rec_id")
      .select(SimilarityExpressions.diceSim(col("bf_a"), col("bf_b")) as "d",
              SimilarityExpressions.jaccardSim(col("bf_a"), col("bf_b")) as "j",
              SimilarityExpressions.hammingDist(col("bf_a"), col("bf_b")) as "h")
      .collect()
    assert(self.forall(r => r.getDouble(0) == 1.0 && r.getDouble(1) == 1.0 && r.getInt(2) == 0))
  }
  test("null input propagates null") {
    val df = encoded(3, 1).withColumn("nullbf", lit(null).cast("binary"))
    val rows = df.select(SimilarityExpressions.diceSim(col("bf"), col("nullbf"))).collect()
    assert(rows.forall(_.isNullAt(0)))
  }

  test("register exposes functions to SQL") {
    SimilarityExpressions.register(spark)
    encoded(6, 1).createOrReplaceTempView("ea")
    encoded(6, 2).createOrReplaceTempView("eb")
    val rows = spark.sql(
      """SELECT a.rec_id id_a, b.rec_id id_b,
        |       dice_sim(a.bf, b.bf) d, jaccard_sim(a.bf, b.bf) j,
        |       hamming_dist(a.bf, b.bf) h, bit_count_bf(a.bf) c
        |FROM ea a CROSS JOIN eb b""".stripMargin).collect()
    assert(rows.length == 36)
    assert(rows.forall(r => r.getDouble(2) >= 0 && r.getDouble(2) <= 1))
    assert(rows.forall(r => r.getDouble(3) <= r.getDouble(2) + 1e-12))
  }
  test("SQL dice agrees with Column API dice") {
    SimilarityExpressions.register(spark)
    val p = pairs(7).select(col("id_a"), col("id_b"), col("bf_a"), col("bf_b"))
    p.createOrReplaceTempView("p")
    val viaSql = spark.sql("SELECT id_a, id_b, dice_sim(bf_a, bf_b) s FROM p")
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    val viaCol = p.select(col("id_a"), col("id_b"),
        SimilarityExpressions.diceSim(col("bf_a"), col("bf_b")) as "s")
      .collect().map(r => (r.getLong(0), r.getLong(1)) -> r.getDouble(2)).toMap
    assert(viaSql == viaCol)
  }

  test("dice oracle: DuckDB recomputes dice from exploded bit positions") {
    val posUdf = udf((bf: Array[Byte]) => BloomFilter.setPositions(bf).map(_.toString))
    val ea = encoded(10, 1)
    val eb = encoded(10, 2)
    val pa = ea.select(col("rec_id").cast("string") as "id",
                       explode(posUdf(col("bf"))) as "pos")
    val pb = eb.select(col("rec_id").cast("string") as "id",
                       explode(posUdf(col("bf"))) as "pos")
    val sparkOut = ea.withColumnRenamed("rec_id", "id_a").withColumnRenamed("bf", "bf_a")
      .crossJoin(eb.withColumnRenamed("rec_id", "id_b").withColumnRenamed("bf", "bf_b"))
      .select(col("id_a").cast("string") as "id_a", col("id_b").cast("string") as "id_b",
              SimilarityExpressions.diceSim(col("bf_a"), col("bf_b")) as "sim")
      .where(col("sim") > 0)
    Oracle.assertEquivalent(sparkOut,
      """SELECT a.id AS id_a, b.id AS id_b,
        |       2.0 * COUNT(*) / (ca.cnt + cb.cnt) AS sim
        |FROM pa a
        |JOIN pb b ON a.pos = b.pos
        |JOIN (SELECT id, COUNT(*) cnt FROM pa GROUP BY id) ca ON ca.id = a.id
        |JOIN (SELECT id, COUNT(*) cnt FROM pb GROUP BY id) cb ON cb.id = b.id
        |GROUP BY a.id, b.id, ca.cnt, cb.cnt""".stripMargin,
      "pa" -> pa, "pb" -> pb)
  }
}
