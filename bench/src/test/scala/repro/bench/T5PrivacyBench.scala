package repro.bench

import repro.SparkSpec
import repro.experiments.T5Privacy

/** Bench for Table T5: privacy/utility trade-off. Claim shape: the
  * frequency attack re-identifies a large share of records from an
  * unsalted field Bloom filter; record-level CLK dilutes it; salting and
  * BLIP collapse it, at a bounded linkage-quality cost.
  */
class T5PrivacyBench extends SparkSpec {

  test("T5 — frequency attack vs linkage quality") {
    val rows = T5Privacy.run(spark, T5Privacy.Params(n = 3000))
    println(T5Privacy.format(rows))
    val m = rows.map(r => r.variant -> r).toMap

    // attack succeeds on the deterministic field encoding
    assert(m("field-bf (none)").reidentRate > 0.5,
      s"plain attack ${m("field-bf (none)").reidentRate}")
    // record-level encoding already reduces single-field alignment
    assert(m("clk (record-level)").reidentRate < m("field-bf (none)").reidentRate)
    // hardening collapses the attack
    assert(m("salted (dob)").reidentRate < 0.05)
    assert(m("blip f=0.05").reidentRate < 0.1)
    // utility: unhardened CLK linkage is strong; BLIP cost is bounded
    assert(m("field-bf (none)").f1 > 0.85, s"baseline F1 ${m("field-bf (none)").f1}")
    assert(m("blip f=0.02").f1 > m("field-bf (none)").f1 - 0.1,
      "light BLIP should cost only a few F1 points")
    assert(m("blip f=0.05").f1 <= m("blip f=0.02").f1 + 0.02,
      "more noise should not improve quality")
  }
}
