package repro.core

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite

class QGramsSpec extends AnyFunSuite {

  test("normalize lower-cases") { assert(QGrams.normalize("SMith") == "smith") }
  test("normalize trims") { assert(QGrams.normalize("  ann ") == "ann") }
  test("normalize collapses inner whitespace") {
    assert(QGrams.normalize("mary  jo\tann") == "mary jo ann")
  }
  test("normalize of null is empty") { assert(QGrams.normalize(null) == "") }

  test("bigrams of 'peter' padded") {
    assert(QGrams.qgramList("peter") ==
      Seq("#p", "pe", "et", "te", "er", "r#"))
  }
  test("padded bigram count is len+1") {
    assert(QGrams.qgramList("smith").size == 6)
  }
  test("unpadded bigram count is len-1") {
    assert(QGrams.qgramList("smith", pad = false).size == 4)
  }
  test("empty string yields no grams") {
    assert(QGrams.qgrams("") == Set.empty)
    assert(QGrams.qgrams(null) == Set.empty)
  }
  test("single char padded q=2 gives 2 grams") {
    assert(QGrams.qgramList("a") == Seq("#a", "a#"))
  }
  test("single char unpadded q=2 gives none") {
    assert(QGrams.qgramList("a", pad = false).isEmpty)
  }
  test("q=1 is character set") {
    assert(QGrams.qgrams("abca", q = 1) == Set("a", "b", "c"))
  }
  test("q=3 trigram example") {
    assert(QGrams.qgramList("abc", q = 3) ==
      Seq("##a", "#ab", "abc", "bc#", "c##"))
  }
  test("q must be positive") {
    assertThrows[IllegalArgumentException](QGrams.qgramList("abc", q = 0))
  }
  test("qgrams deduplicates repeats") {
    // 'aaaa' padded has grams #a, aa, a# — 3 distinct of 5 positional
    assert(QGrams.qgrams("aaaa") == Set("#a", "aa", "a#"))
  }

  test("recordGrams unions fields") {
    val g = QGrams.recordGrams(Seq("ab", "bc"))
    assert(g == QGrams.qgrams("ab") ++ QGrams.qgrams("bc"))
  }
  test("recordGrams tagged keeps fields distinct") {
    val g = QGrams.recordGrams(Seq("ab", "ab"), tagged = true)
    assert(g.size == 2 * QGrams.qgrams("ab").size)
    assert(g.forall(t => t.startsWith("0:") || t.startsWith("1:")))
  }

  test("jaccard identical sets is 1") {
    val s = QGrams.qgrams("peter")
    assert(QGrams.jaccard(s, s) == 1.0)
  }
  test("jaccard disjoint sets is 0") {
    assert(QGrams.jaccard(Set("aa"), Set("bb")) == 0.0)
  }
  test("jaccard both empty is 0") {
    assert(QGrams.jaccard(Set.empty, Set.empty) == 0.0)
  }
  test("dice identical sets is 1") {
    val s = QGrams.qgrams("peter")
    assert(QGrams.dice(s, s) == 1.0)
  }
  test("dice known value") {
    // {a,b,c} vs {b,c,d}: 2*2/(3+3) = 2/3
    assert(math.abs(QGrams.dice(Set("a", "b", "c"), Set("b", "c", "d")) - 2.0 / 3) < 1e-12)
  }
  test("dice >= jaccard always (on samples)") {
    val gen = Gen.listOfN(8, Gen.alphaLowerStr.map(_.take(6)))
    for (i <- 1 to 50) {
      val xs = gen.sample.get
      val a = QGrams.qgrams(xs.mkString)
      val b = QGrams.qgrams(xs.reverse.mkString.drop(3))
      assert(QGrams.dice(a, b) + 1e-12 >= QGrams.jaccard(a, b), s"iter $i")
    }
  }
  test("similar strings score higher than dissimilar") {
    val a = QGrams.qgrams("catherine")
    assert(QGrams.jaccard(a, QGrams.qgrams("katherine")) >
           QGrams.jaccard(a, QGrams.qgrams("zzyzx")))
  }
  test("one-typo bigram jaccard stays high") {
    val j = QGrams.jaccard(QGrams.qgrams("jennifer"), QGrams.qgrams("jenifer"))
    assert(j > 0.6, s"got $j")
  }
}
