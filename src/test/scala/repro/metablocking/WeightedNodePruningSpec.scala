package repro.metablocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.blocking.{Candidates, StandardBlocking}
import repro.core.Encodings
import repro.data.PersonGen

class WeightedNodePruningSpec extends SparkSpec {
  import spark.implicits._

  test("weightedPairs counts common blocks") {
    val aKeys = Seq((1L, "x"), (1L, "y"), (2L, "x")).toDF("id", "key")
    val bKeys = Seq((10L, "x"), (10L, "y"), (20L, "y")).toDF("id", "key")
    val m = WeightedNodePruning.weightedPairs(aKeys, bKeys).collect()
      .map(r => (r.getLong(0), r.getLong(1)) -> r.getLong(2)).toMap
    assert(m((1L, 10L)) == 2) // shares x and y
    assert(m((2L, 10L)) == 1)
    assert(m((1L, 20L)) == 1)
  }
  test("prune keeps edges at or above an endpoint average") {
    // 1-10 weight 2; 1-20 weight 1  → avg(1)=1.5; avg(10)=2, avg(20)=1
    val pairs = Seq((1L, 10L, 2L), (1L, 20L, 1L)).toDF("id_a", "id_b", "weight")
    val kept = WeightedNodePruning.prune(pairs).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    // (1,10): w=2 >= avg_a 1.5 → keep. (1,20): w=1 < 1.5 but >= avg_b 1 → keep.
    assert(kept == Set((1L, 10L), (1L, 20L)))
  }
  test("prune drops strictly sub-average edges") {
    // node 1 has weights 3,1,1,1 → avg 1.5; the weight-1 edges survive only
    // if their b-endpoint average allows; give b-nodes extra heavy edges
    val pairs = Seq(
      (1L, 10L, 3L), (1L, 20L, 1L), (1L, 30L, 1L), (1L, 40L, 1L),
      (2L, 20L, 5L), (2L, 30L, 5L), (2L, 40L, 5L),
    ).toDF("id_a", "id_b", "weight")
    val kept = WeightedNodePruning.prune(pairs).collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSet
    assert(kept.contains((1L, 10L)))
    assert(!kept.contains((1L, 20L))) // 1 < avg_a=1.5 and 1 < avg_b=3
  }
  test("single-edge graph is kept (own average)") {
    val pairs = Seq((1L, 10L, 1L)).toDF("id_a", "id_b", "weight")
    assert(WeightedNodePruning.prune(pairs).count() == 1)
  }
  test("end-to-end: WNP prunes comparisons, keeps most matches") {
    val mk = (party: Int, corr: Double) => {
      val df = PersonGen.database(spark, party, 0, 500, corr, seed = 61L)
      val k1 = Encodings.withSoundexKey(df, Seq("fname", "lname"), "s", out = "k1")
      val k2 = Encodings.withSoundexKey(k1, Seq("lname", "city"), "s", out = "k2")
      (StandardBlocking.keys(k2, "k1")
        .unionByName(StandardBlocking.keys(k2, "k2")), df)
    }
    val (aKeys, aDf) = mk(1, 0.0)
    val (bKeys, bDf) = mk(2, 0.3)
    val truth = PersonGen.truthPairs(aDf, bDf)
    val all = WeightedNodePruning.weightedPairs(aKeys, bKeys)
    val pruned = WeightedNodePruning.candidates(aKeys, bKeys)
    assert(pruned.count() < all.count())
    val pc = Candidates.pairsCompleteness(pruned, truth)
    assert(pc > 0.75, s"PC after WNP = $pc")
  }
  test("oracle: CBS weights equal DuckDB group-by count") {
    val aKeys = Seq((1L, "x"), (1L, "y"), (2L, "x"), (2L, "z")).toDF("id", "key")
    val bKeys = Seq((10L, "x"), (10L, "y"), (20L, "z"), (20L, "x")).toDF("id", "key")
    val sparkOut = WeightedNodePruning.weightedPairs(aKeys, bKeys)
      .select(col("id_a").cast("string") as "id_a",
              col("id_b").cast("string") as "id_b",
              col("weight").cast("long") as "weight")
    Oracle.assertEquivalent(sparkOut,
      """SELECT a.id AS id_a, b.id AS id_b, COUNT(*) AS weight
        |FROM a JOIN b ON a.key = b.key
        |GROUP BY a.id, b.id""".stripMargin,
      "a" -> aKeys, "b" -> bKeys)
  }
}
