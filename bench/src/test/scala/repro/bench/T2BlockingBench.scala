package repro.bench

import repro.SparkSpec
import repro.experiments.T2Blocking

/** Bench for Table T2: private blocking. Claim shape: LSH blocking keeps
  * PC near 1 at RR > 0.95 even under heavy corruption, while phonetic
  * standard blocking loses completeness; everything prunes orders of
  * magnitude off the cross product.
  */
class T2BlockingBench extends SparkSpec {

  test("T2 — private blocking: candidates, RR, PC") {
    val rows = T2Blocking.run(spark, T2Blocking.Params(n = 10000, corruption = 0.3))
    println(T2Blocking.format(rows))
    val m = rows.map(r => r.method -> r).toMap

    assert(m("cartesian").candidates == 100000000L)
    for (meth <- Seq("soundex-block", "hamming-lsh", "minhash-lsh")) {
      assert(m(meth).rr > 0.95, s"$meth RR ${m(meth).rr}")
    }
    // LSH methods dominate phonetic blocking on completeness
    assert(m("hamming-lsh").pc > m("soundex-block").pc)
    assert(m("minhash-lsh").pc > m("soundex-block").pc)
    assert(m("hamming-lsh").pc > 0.93, s"HLSH PC ${m("hamming-lsh").pc}")
    assert(m("minhash-lsh").pc > 0.93, s"MLSH PC ${m("minhash-lsh").pc}")
    // soundex loses a visible share of matches under 30% corruption
    assert(m("soundex-block").pc < 0.95, s"soundex PC ${m("soundex-block").pc}")
  }
}
