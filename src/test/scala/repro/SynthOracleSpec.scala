package repro

import org.apache.spark.sql.functions._

/** Sanity checks that the provided scaffolding (TPC-H-lite generators +
  * DuckDB oracle) works in this environment — the PPRL suites build their
  * oracle tests on the same machinery.
  */
class SynthOracleSpec extends SparkSpec {

  test("lineitem generator row count at SF=0.001") {
    assert(SynthData.lineitem(spark, 0.001).count() == 6000)
  }
  test("oracle validates a group-by over lineitem") {
    val li = SynthData.lineitem(spark, 0.001)
      .select(col("l_returnflag"), col("l_quantity").cast("string") as "l_quantity")
    val sparkOut = li.groupBy("l_returnflag")
      .agg(count("*") as "cnt", sum(col("l_quantity").cast("double")) as "qty")
    Oracle.assertEquivalent(sparkOut,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM li GROUP BY l_returnflag""".stripMargin,
      "li" -> li)
  }
  test("oracle validates a join between orders and customer") {
    val o = SynthData.orders(spark, 0.002).select("o_orderkey", "o_custkey")
    val c = SynthData.customer(spark, 0.002).select("c_custkey", "c_mktsegment")
    val sparkOut = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count("*") as "cnt")
    Oracle.assertEquivalent(sparkOut,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM o JOIN c ON o.o_custkey = c.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "o" -> o, "c" -> c)
  }
  test("zipf keys are skewed toward small ranks") {
    val df = SynthData.zipfKeys(spark, 20000, 1000)
    val top = df.groupBy("k").count().orderBy(col("count").desc).head.getLong(0)
    assert(top <= 3, s"most frequent key should be a head rank, got $top")
  }
}
