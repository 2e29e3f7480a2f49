package repro.metablocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.blocking.Candidates

/** Meta-blocking by weighted node pruning (WNP).
  *
  * Input: per-record block keys `(id, key)` from each party, possibly from
  * several blocking functions unioned together. The blocking graph weighs
  * each cross-party pair by CBS — the number of blocks it co-occurs in —
  * and WNP keeps a pair iff its weight reaches the average weight of
  * either endpoint's neighbourhood. Redundancy-positive: matches co-occur
  * in many blocks, random pairs in few, so pruning low-weight edges drops
  * comparisons much faster than recall (Papadakis et al.).
  */
object WeightedNodePruning {

  /** Cross-party pairs with CBS weights `(id_a, id_b, weight)`. */
  def weightedPairs(aKeys: DataFrame, bKeys: DataFrame): DataFrame =
    aKeys.withColumnRenamed("id", "id_a")
      .join(bKeys.withColumnRenamed("id", "id_b"), "key")
      .groupBy("id_a", "id_b").agg(count("*") as "weight")

  /** WNP: keep a pair iff weight ≥ avg weight of `id_a`'s or of `id_b`'s
    * edges. Returns canonical candidate pairs.
    */
  def prune(pairs: DataFrame): DataFrame = {
    val avgA = pairs.groupBy("id_a").agg(avg("weight") as "avg_a")
    val avgB = pairs.groupBy("id_b").agg(avg("weight") as "avg_b")
    Candidates.canonical(
      pairs.join(avgA, "id_a").join(avgB, "id_b")
        .where(col("weight") >= col("avg_a") || col("weight") >= col("avg_b"))
        .select("id_a", "id_b"))
  }

  /** Convenience: weighted pairs then WNP in one call. */
  def candidates(aKeys: DataFrame, bKeys: DataFrame): DataFrame =
    prune(weightedPairs(aKeys, bKeys))
}
