package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments._
import repro.pprl.Pipeline

/** Shared SparkSession bootstrap for the spark-submit entrypoints. */
object JobSession {
  def build(app: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()

  def argLong(args: Array[String], i: Int, default: Long): Long =
    if (args.length > i) args(i).toLong else default
}

/** T1: linkage quality vs encoding. Usage: T1QualityJob [n]. */
object T1QualityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t1-quality")
    println(T1Quality.format(T1Quality.run(spark, JobSession.argLong(args, 0, 1500))))
    spark.stop()
  }
}

/** T2: private blocking. Usage: T2BlockingJob [n]. */
object T2BlockingJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t2-blocking")
    val p = T2Blocking.Params(n = JobSession.argLong(args, 0, 10000))
    println(T2Blocking.format(T2Blocking.run(spark, p)))
    spark.stop()
  }
}

/** T3: meta-blocking & filtering. Usage: T3FilteringJob [n]. */
object T3FilteringJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t3-filtering")
    val p = T3Filtering.Params(n = JobSession.argLong(args, 0, 10000))
    println(T3Filtering.format(T3Filtering.run(spark, p)))
    spark.stop()
  }
}

/** T4: multi-party linkage. Usage: T4MultiPartyJob [universe]. */
object T4MultiPartyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t4-multiparty")
    val p = T4MultiParty.Params(universe = JobSession.argLong(args, 0, 4000))
    println(T4MultiParty.format(T4MultiParty.run(spark, Seq(3, 5), p)))
    spark.stop()
  }
}

/** T5: privacy/utility. Usage: T5PrivacyJob [n]. */
object T5PrivacyJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t5-privacy")
    val p = T5Privacy.Params(n = JobSession.argLong(args, 0, 3000))
    println(T5Privacy.format(T5Privacy.run(spark, p)))
    spark.stop()
  }
}

/** T6: scalability. Usage: T6ScalabilityJob [maxN]. */
object T6ScalabilityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("t6-scalability")
    val maxN = JobSession.argLong(args, 0, 40000)
    val sizes = Seq(5000L, 10000L, 20000L, 40000L).filter(_ <= maxN)
    val sizeRows = T6Scalability.runSizes(spark, sizes)
    val partRows = T6Scalability.runPartitions(spark, math.min(20000L, maxN))
    println(T6Scalability.format(sizeRows, partRows))
    spark.stop()
  }
}

/** End-to-end pipeline demo on a generated pair. Usage: PipelineJob [n]. */
object PipelineJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("pprl-pipeline")
    val n = JobSession.argLong(args, 0, 10000)
    val (a, b) = repro.data.PersonGen.pair(spark, n, n, n / 2, 0.2)
    val res = Pipeline.run(a, b, Pipeline.Config())
    println(s"candidates=${res.nCandidates} matches=${res.nMatches} " +
      res.timings.map { case (s, ms) => s"$s=${ms}ms" }.mkString(" "))
    spark.stop()
  }
}
