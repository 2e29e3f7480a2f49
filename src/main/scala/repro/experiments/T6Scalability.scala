package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.data.PersonGen
import repro.matching.Classifier
import repro.pprl.Pipeline

/** T6 — scalability of the full PPRL pipeline as distributed dataflow:
  * wall time and stage breakdown versus dataset size, plus a shuffle-
  * partition sweep at fixed size to show parallel speedup. With LSH
  * blocking the candidate count grows near-linearly in n, so total time
  * should too — the contrast with the quadratic cross product.
  */
object T6Scalability {

  case class SizeRow(n: Long, candidates: Long, matches: Long, f1: Double,
                     encodeMs: Long, blockMs: Long, scoreMs: Long,
                     classifyMs: Long, totalMs: Long)
  case class PartRow(partitions: Int, totalMs: Long)

  case class Params(corruption: Double = 0.2, overlapFrac: Double = 0.5,
                    cfg: Pipeline.Config = Pipeline.Config(), seed: Long = 42L)

  def runSizes(spark: SparkSession, sizes: Seq[Long] = Seq(5000, 10000, 20000, 40000),
               prm: Params = Params()): Seq[SizeRow] =
    sizes.map { n =>
      val (a, b) = PersonGen.pair(spark, n, n, (n * prm.overlapFrac).toLong,
                                  prm.corruption, maxEdits = 2, seed = prm.seed)
      val truth = PersonGen.truthPairs(a, b)
      val res = Pipeline.run(a, b, prm.cfg)
      val (_, _, f1) = Classifier.prf(res.matches, truth)
      res.matches.unpersist()
      SizeRow(n, res.nCandidates, res.nMatches, f1,
              res.millis("encode"), res.millis("block"), res.millis("score"),
              res.millis("classify"), res.totalMillis)
    }

  def runPartitions(spark: SparkSession, n: Long = 20000,
                    partitions: Seq[Int] = Seq(1, 4, 16),
                    prm: Params = Params()): Seq[PartRow] = {
    val before = spark.conf.get("spark.sql.shuffle.partitions")
    try {
      partitions.map { parts =>
        spark.conf.set("spark.sql.shuffle.partitions", parts.toString)
        val (a0, b0) = PersonGen.pair(spark, n, n, (n * prm.overlapFrac).toLong,
                                      prm.corruption, maxEdits = 2, seed = prm.seed)
        val res = Pipeline.run(a0.repartition(parts), b0.repartition(parts), prm.cfg)
        res.matches.unpersist()
        PartRow(parts, res.totalMillis)
      }
    } finally spark.conf.set("spark.sql.shuffle.partitions", before)
  }

  def format(sizeRows: Seq[SizeRow], partRows: Seq[PartRow]): String = {
    val t1 = Fmt.table("T6a — pipeline scaling with dataset size (per party)",
      Seq("n", "candidates", "matches", "F1", "encode", "block", "score", "classify", "total"),
      sizeRows.map(r => Seq(r.n.toString, r.candidates.toString, r.matches.toString,
                            Fmt.f(r.f1), Fmt.secs(r.encodeMs), Fmt.secs(r.blockMs),
                            Fmt.secs(r.scoreMs), Fmt.secs(r.classifyMs),
                            Fmt.secs(r.totalMs))))
    val t2 = Fmt.table("T6b — shuffle-partition sweep (n=20k per party)",
      Seq("partitions", "total"),
      partRows.map(r => Seq(r.partitions.toString, Fmt.secs(r.totalMs))))
    s"$t1\n\n$t2"
  }
}
