package repro.bench

import repro.SparkSpec
import repro.experiments.T4MultiParty

/** Bench for Table T4: multi-party linkage. Claim shape: LSH keeps
  * comparisons orders of magnitude below the naive Σ n_i·n_j; cluster
  * quality stays high as p grows (but does not improve); subset-match
  * counts track ground truth; ring communication outgrows star/tree.
  */
class T4MultiPartyBench extends SparkSpec {

  test("T4 — multi-party linkage, subset matching, communication") {
    val res = T4MultiParty.run(spark, Seq(3, 5), T4MultiParty.Params(universe = 4000))
    println(T4MultiParty.format(res))

    for (l <- res.links) {
      assert(l.comparisons < l.naive / 20,
        s"p=${l.p}: ${l.comparisons} comparisons vs naive ${l.naive}")
      assert(l.f1 > 0.8, s"p=${l.p} cluster F1 ${l.f1}")
    }
    // subset matching tracks truth; the error budget grows toward m = p,
    // where a single missed edge (pairwise recall ≈ 0.88 under two-sided
    // corruption) can disconnect the full-span cluster
    for (s <- res.subsets if s.truth > 0) {
      val err = math.abs(s.estimated - s.truth).toDouble / s.truth
      assert(err < 0.30, s"p=${s.p} m=${s.m}: est ${s.estimated} vs ${s.truth}")
    }
    // estimates must be monotone non-increasing in m, like the truth
    for (p <- Seq(3, 5)) {
      val ests = res.subsets.filter(_.p == p).sortBy(_.m).map(_.estimated)
      assert(ests.sliding(2).forall { case Seq(a, b) => b <= a }, s"p=$p: $ests")
    }
    // communication: ring cost Σi·n grows quadratically in p — equal to
    // star at p=3 (3n vs 3n), strictly worse by p=5 (10n vs 5n)
    for (p <- Seq(3, 5)) {
      val byPat = res.comms.filter(_.p == p).map(c => c.pattern -> c.megabytes).toMap
      assert(byPat("ring") >= byPat("star/LU") * 0.99)
      assert(byPat("tree") <= byPat("ring"))
    }
    val ring5 = res.comms.find(c => c.p == 5 && c.pattern == "ring").get
    val star5 = res.comms.find(c => c.p == 5 && c.pattern == "star/LU").get
    assert(ring5.megabytes > 1.5 * star5.megabytes,
      s"ring ${ring5.megabytes}MB should clearly exceed star ${star5.megabytes}MB at p=5")
  }
}
