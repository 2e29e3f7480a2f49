package repro.blocking

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Conventions and quality metrics for candidate-pair generation.
  *
  * A candidate set is a DataFrame with columns `(id_a, id_b)` — `rec_id`s
  * from the two parties — already deduplicated. Blocking quality is
  * reported with the standard triple:
  *  - pairs completeness  PC = |cand ∩ truth| / |truth|   (recall of blocking)
  *  - pairs quality       PQ = |cand ∩ truth| / |cand|    (precision of blocking)
  *  - reduction ratio     RR = 1 − |cand| / (nA · nB)
  */
object Candidates {

  /** Normalize a pair DataFrame: expected columns, distinct rows. */
  def canonical(pairs: DataFrame): DataFrame =
    pairs.select(col("id_a").cast("long"), col("id_b").cast("long")).distinct()

  /** |cand ∩ truth| — both inputs in canonical pair form. */
  def truePositives(cand: DataFrame, truth: DataFrame): Long =
    canonical(cand).join(canonical(truth), Seq("id_a", "id_b")).count()

  def pairsCompleteness(cand: DataFrame, truth: DataFrame): Double = {
    val t = truth.count()
    if (t == 0) 1.0 else truePositives(cand, truth).toDouble / t
  }

  def pairsQuality(cand: DataFrame, truth: DataFrame): Double = {
    val c = canonical(cand).count()
    if (c == 0) 0.0 else truePositives(cand, truth).toDouble / c
  }

  def reductionRatio(candCount: Long, nA: Long, nB: Long): Double = {
    require(nA > 0 && nB > 0, "empty database")
    1.0 - candCount.toDouble / (nA.toDouble * nB.toDouble)
  }
}
