package repro.blocking

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}

class CandidatesSpec extends SparkSpec {
  import spark.implicits._

  private def df(ps: (Long, Long)*) = ps.toDF("id_a", "id_b")

  test("canonical deduplicates") {
    assert(Candidates.canonical(df((1L, 2L), (1L, 2L), (3L, 4L))).count() == 2)
  }
  test("canonical keeps column names") {
    assert(Candidates.canonical(df((1L, 2L))).columns.toSeq == Seq("id_a", "id_b"))
  }
  test("truePositives counts the intersection") {
    val cand = df((1L, 10L), (2L, 20L), (3L, 30L))
    val truth = df((2L, 20L), (3L, 30L), (4L, 40L))
    assert(Candidates.truePositives(cand, truth) == 2)
  }
  test("pairsCompleteness basic") {
    val cand = df((1L, 10L), (2L, 20L))
    val truth = df((1L, 10L), (2L, 20L), (3L, 30L), (4L, 40L))
    assert(Candidates.pairsCompleteness(cand, truth) == 0.5)
  }
  test("pairsCompleteness of empty truth is 1") {
    assert(Candidates.pairsCompleteness(df((1L, 2L)), df()) == 1.0)
  }
  test("pairsQuality basic") {
    val cand = df((1L, 10L), (2L, 20L), (5L, 50L), (6L, 60L))
    val truth = df((1L, 10L), (2L, 20L))
    assert(Candidates.pairsQuality(cand, truth) == 0.5)
  }
  test("pairsQuality of empty candidates is 0") {
    assert(Candidates.pairsQuality(df(), df((1L, 2L))) == 0.0)
  }
  test("reductionRatio") {
    assert(Candidates.reductionRatio(100, 100, 100) == 0.99)
    assert(Candidates.reductionRatio(10000, 100, 100) == 0.0)
  }
  test("reductionRatio rejects empty databases") {
    assertThrows[IllegalArgumentException](Candidates.reductionRatio(1, 0, 10))
  }
  test("oracle: intersection count via DuckDB") {
    val cand = df((1L, 10L), (2L, 20L), (3L, 30L), (3L, 30L))
    val truth = df((2L, 20L), (3L, 30L), (9L, 90L))
    val sparkOut = Candidates.canonical(cand)
      .join(Candidates.canonical(truth), Seq("id_a", "id_b"))
      .agg(count("*") as "tp")
    Oracle.assertEquivalent(sparkOut,
      """SELECT COUNT(*) AS tp FROM
        |  (SELECT DISTINCT id_a, id_b FROM cand) c
        |  JOIN truth t ON c.id_a = t.id_a AND c.id_b = t.id_b""".stripMargin,
      "cand" -> cand, "truth" -> truth)
  }
}
