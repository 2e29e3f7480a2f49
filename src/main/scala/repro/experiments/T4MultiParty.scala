package repro.experiments

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Encodings
import repro.data.PersonGen
import repro.matching.{Classifier, Clustering, MultiParty}

/** T4 — multi-party linkage (yet-to-come axis): p ∈ {3, 5} parties, CLK
  * encodings, pairwise Hamming-LSH blocking, connected-components
  * clustering, subset matching (entities in ≥ m of p parties), and the
  * analytic communication-pattern costs.
  */
object T4MultiParty {

  case class LinkRow(p: Int, comparisons: Long, naive: Long,
                     clusters: Long, precision: Double, recall: Double,
                     f1: Double, millis: Long)
  case class SubsetRow(p: Int, m: Int, estimated: Long, truth: Long)
  case class CommRow(p: Int, pattern: String, messages: Long, megabytes: Double)

  // k=10 keeps BF fill ≈ 0.35: at 50% fill the *baseline* cross-Dice of
  // unrelated filters is ≈ 0.5, which lifts name-sharing non-matches over
  // a 0.8 threshold and lets connected components snowball into giant
  // clusters. Low fill + threshold 0.9 keeps clusters entity-pure.
  case class Params(universe: Long = 4000, inclusionProb: Double = 0.6,
                    corruption: Double = 0.2, l: Int = 1024, k: Int = 10,
                    lshTables: Int = 40, lshBits: Int = 20,
                    threshold: Double = 0.9, secret: String = "s3cret",
                    seed: Long = 42L)

  case class Result(links: Seq[LinkRow], subsets: Seq[SubsetRow], comms: Seq[CommRow])

  def run(spark: SparkSession, ps: Seq[Int] = Seq(3, 5),
          prm: Params = Params()): Result = {
    val links = scala.collection.mutable.ArrayBuffer.empty[LinkRow]
    val subsets = scala.collection.mutable.ArrayBuffer.empty[SubsetRow]
    val comms = scala.collection.mutable.ArrayBuffer.empty[CommRow]

    for (p <- ps) {
      val t0 = System.nanoTime()
      val raw = PersonGen.parties(spark, p, prm.universe, prm.inclusionProb,
                                  prm.corruption, maxEdits = 2, seed = prm.seed)
      val parties = raw.map(df =>
        // dob included: popular-name collisions would otherwise merge clusters
        Encodings.withClk(df, Seq("fname", "lname", "dob", "city"), prm.l, prm.k,
                          secret = prm.secret)
          .select("rec_id", "ent_id", "bf").persist())
      val sizes = parties.map(_.count())

      val (edges, comparisons) = MultiParty.pairwiseEdges(
        parties, "bf", prm.l, prm.lshTables, prm.lshBits, prm.threshold, prm.seed)
      val comp = MultiParty.clusters(edges).persist()
      val nClusters = comp.select("comp").distinct().count()

      // pairwise cluster quality vs ground-truth cross-party pairs
      val predPairs = Clustering.clusterPairs(comp)
      val truthPairs = (for {
        i <- parties.indices; j <- parties.indices if i < j
      } yield PersonGen.truthPairs(parties(i), parties(j)))
        .reduce(_ unionByName _)
      val (prec, rec, f1) = Classifier.prf(predPairs, truthPairs)
      val ms = (System.nanoTime() - t0) / 1000000L
      links += LinkRow(p, comparisons, MultiParty.naiveComparisons(sizes),
                       nClusters, prec, rec, f1, ms)

      // subset matching: estimated (clusters spanning >= m parties) vs truth
      val membership = raw.zipWithIndex.map { case (df, i) =>
        df.select(col("ent_id"), lit(i + 1) as "party")
      }.reduce(_ unionByName _)
      val truthCounts = membership.groupBy("ent_id")
        .agg(countDistinct("party") as "parties").persist()
      for (m <- 2 to p) {
        val est = MultiParty.subsetMatchCount(comp, m)
        val tru = truthCounts.where(col("parties") >= m).count()
        subsets += SubsetRow(p, m, est, tru)
      }
      truthCounts.unpersist()

      for (c <- MultiParty.commCosts(sizes, prm.l / 8L)) {
        comms += CommRow(p, c.pattern, c.messages, c.bytes / 1048576.0)
      }
      comp.unpersist(); parties.foreach(_.unpersist())
    }
    Result(links.toSeq, subsets.toSeq, comms.toSeq)
  }

  def format(r: Result): String = {
    val t1 = Fmt.table("T4a — multi-party linkage quality & cost",
      Seq("p", "comparisons", "naive pairs", "clusters", "precision", "recall", "F1", "time"),
      r.links.map(x => Seq(x.p.toString, x.comparisons.toString, x.naive.toString,
                           x.clusters.toString, Fmt.f(x.precision), Fmt.f(x.recall),
                           Fmt.f(x.f1), Fmt.secs(x.millis))))
    val t2 = Fmt.table("T4b — subset matching (entities in >= m of p parties)",
      Seq("p", "m", "estimated", "truth", "rel err"),
      r.subsets.map(x => Seq(x.p.toString, x.m.toString, x.estimated.toString,
                             x.truth.toString,
                             Fmt.pct(if (x.truth == 0) 0.0
                                     else math.abs(x.estimated - x.truth).toDouble / x.truth))))
    val t3 = Fmt.table("T4c — communication patterns (analytic model)",
      Seq("p", "pattern", "messages", "MB moved"),
      r.comms.map(x => Seq(x.p.toString, x.pattern, x.messages.toString,
                           Fmt.f(x.megabytes, 1))))
    s"$t1\n\n$t2\n\n$t3"
  }
}
