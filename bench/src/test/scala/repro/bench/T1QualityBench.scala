package repro.bench

import repro.SparkSpec
import repro.experiments.T1Quality

/** Bench for Table T1 (EXPERIMENTS.md): linkage quality vs encoding.
  * Prints the table and asserts the claim shape from the surveyed
  * literature: probabilistic encodings ≈ plaintext ≫ derived/exact keys
  * under corruption; everything ≈ perfect on clean data.
  */
class T1QualityBench extends SparkSpec {

  test("T1 — linkage quality vs encoding technique") {
    val rows = T1Quality.run(spark, n = 1500, corruptions = Seq(0.0, 0.2, 0.4))
    println(T1Quality.format(rows))

    def f1(enc: String, corr: Double): Double =
      rows.find(r => r.encoder == enc && r.corruption == corr).get.f1

    // clean data: every technique is near-perfect
    for (e <- Seq("hmac-exact", "slk-581", "field-bf-dice", "clk-dice", "plain-qgram"))
      assert(f1(e, 0.0) > 0.95, s"$e clean F1 ${f1(e, 0.0)}")

    // corruption: exact/derived keys collapse, probabilistic encodings survive
    for (corr <- Seq(0.2, 0.4)) {
      assert(f1("clk-dice", corr) > f1("hmac-exact", corr),
        s"CLK should beat exact at $corr")
      assert(f1("clk-dice", corr) > f1("slk-581", corr),
        s"CLK should beat SLK at $corr")
      // BF encoding within a few points of the plaintext upper bound
      assert(f1("plain-qgram", corr) - f1("clk-dice", corr) < 0.05,
        s"CLK ${f1("clk-dice", corr)} vs plaintext ${f1("plain-qgram", corr)} at $corr")
    }
    // exact matching loses roughly the corruption rate in recall
    val exact40 = rows.find(r => r.encoder == "hmac-exact" && r.corruption == 0.4).get
    assert(exact40.recall < 0.75, s"exact recall ${exact40.recall} at 40% corruption")
  }
}
