package repro.filtering

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.BloomFilter

/** PPJoin-style similarity-join filtering (Sehili et al., "PPRL with
  * PPJoin") over integer token arrays. Tokens may be hashed q-grams or the
  * set-bit positions of a Bloom filter ([[bfPositions]]) — both are just
  * sets of ints to the filter.
  *
  * Implemented filters for a Jaccard threshold t:
  *  - '''length filter''': |y| ∈ [t·|x|, |x|/t] is necessary for J ≥ t;
  *  - '''prefix filter''': with tokens globally ordered by ascending
  *    document frequency, two sets with J ≥ t must share a token within
  *    each other's first |x| − ⌈t·|x|⌉ + 1 tokens.
  * The position filter is intentionally omitted (DESIGN.md §6); achieved
  * pruning is reported so the simplification stays visible.
  */
object PPJoin {

  /** Dice threshold → equivalent Jaccard threshold (J = D / (2 − D)). */
  def diceToJaccard(t: Double): Double = t / (2.0 - t)

  /** Column of sorted set-bit positions of a Bloom filter. */
  def bfPositions(bf: Column): Column = {
    val f = udf((bytes: Array[Byte]) => BloomFilter.setPositions(bytes))
    f(bf)
  }

  /** Re-rank both parties' token arrays by ascending global document
    * frequency (the PPJoin canonical order). Input: `(id, tokens:
    * array<int>)` per party; output per party: `(id, toks: array<int>)`
    * rank arrays sorted ascending, plus the shared token→rank map size.
    */
  def rankTokens(a: DataFrame, b: DataFrame): (DataFrame, DataFrame) = {
    val exploded = a.select(col("id"), explode(col("tokens")) as "tok")
      .unionByName(b.select(col("id"), explode(col("tokens")) as "tok"))
    val ranks = exploded.groupBy("tok").agg(count("*") as "df")
      .withColumn("rank", row_number().over(Window.orderBy(col("df"), col("tok"))))
      .select("tok", "rank")
    def rerank(df: DataFrame): DataFrame =
      df.select(col("id"), explode(col("tokens")) as "tok")
        .join(ranks, "tok")
        .groupBy("id").agg(sort_array(collect_list(col("rank"))) as "toks")
    (rerank(a), rerank(b))
  }

  /** Prefix length |x| − ⌈t·|x|⌉ + 1 (≥ 1 for non-empty sets). */
  def prefixLen(size: Column, t: Double): Column =
    greatest(lit(1), size - ceil(lit(t) * size).cast("int") + lit(1))

  /** Candidate pairs under length + prefix filtering at Jaccard ≥ t.
    * Inputs are `(id, toks)` rank arrays from [[rankTokens]].
    */
  def candidates(aRanked: DataFrame, bRanked: DataFrame, t: Double): DataFrame = {
    require(t > 0 && t <= 1, s"Jaccard threshold must be in (0,1], got $t")
    def prefixes(df: DataFrame, side: String): DataFrame =
      df.select(col("id") as s"id_$side", size(col("toks")) as s"len_$side",
                explode(slice(col("toks"), lit(1),
                  greatest(lit(1), size(col("toks"))
                    - ceil(lit(t) * size(col("toks"))).cast("int") + lit(1)))) as "tok")
    prefixes(aRanked, "a").join(prefixes(bRanked, "b"), "tok")
      .where(col("len_b") >= ceil(lit(t) * col("len_a")) &&
             col("len_b") <= floor(col("len_a") / lit(t)))
      .select("id_a", "id_b").distinct()
  }

  /** Verified pairs: exact Jaccard over the rank arrays, filtered at t.
    * Returns `(id_a, id_b, jaccard)`.
    */
  def verify(cands: DataFrame, aRanked: DataFrame, bRanked: DataFrame,
             t: Double): DataFrame = {
    val jac = udf((x: Seq[Int], y: Seq[Int]) => {
      val xs = x.toSet; val ys = y.toSet
      val u = xs.union(ys).size
      if (u == 0) 0.0 else xs.intersect(ys).size.toDouble / u
    })
    cands
      .join(aRanked.select(col("id") as "id_a", col("toks") as "toks_a"), "id_a")
      .join(bRanked.select(col("id") as "id_b", col("toks") as "toks_b"), "id_b")
      .withColumn("jaccard", jac(col("toks_a"), col("toks_b")))
      .where(col("jaccard") >= t)
      .select("id_a", "id_b", "jaccard")
  }

  /** Standalone length filter over pre-joined pairs carrying set sizes. */
  def lengthFilter(pairs: DataFrame, lenA: String, lenB: String, t: Double): DataFrame =
    pairs.where(col(lenB) >= ceil(lit(t) * col(lenA)) &&
                col(lenB) <= floor(col(lenA) / lit(t)))
}
