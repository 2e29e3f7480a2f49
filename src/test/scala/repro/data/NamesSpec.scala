package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Hashing

class NamesSpec extends AnyFunSuite {

  test("pools are non-empty and lower-case") {
    for (pool <- Seq(Names.FirstNames, Names.LastNames, Names.Cities)) {
      assert(pool.nonEmpty)
      assert(pool.forall(n => n == n.toLowerCase && n.nonEmpty))
    }
  }
  test("pools have no duplicates") {
    assert(Names.FirstNames.distinct.size == Names.FirstNames.size)
    assert(Names.LastNames.distinct.size == Names.LastNames.size)
    assert(Names.Cities.distinct.size == Names.Cities.size)
  }
  test("zipfCdf is monotone and ends at 1") {
    val cdf = Names.zipfCdf(50, 1.0)
    assert(cdf.last == 1.0)
    assert(cdf.sliding(2).forall { case Array(a, b) => b >= a })
  }
  test("zipfCdf rejects empty pool") {
    assertThrows[IllegalArgumentException](Names.zipfCdf(0, 1.0))
  }
  test("zipfIndex boundary cases") {
    val cdf = Names.zipfCdf(10, 1.0)
    assert(Names.zipfIndex(cdf, 0.0) == 0)
    assert(Names.zipfIndex(cdf, 0.9999999) == 9 || Names.zipfIndex(cdf, 0.9999999) < 10)
  }
  test("zipfIndex inverse-CDF correctness on a small cdf") {
    val cdf = Array(0.5, 0.8, 1.0)
    assert(Names.zipfIndex(cdf, 0.2) == 0)
    assert(Names.zipfIndex(cdf, 0.5) == 0)  // first entry >= u
    assert(Names.zipfIndex(cdf, 0.6) == 1)
    assert(Names.zipfIndex(cdf, 0.95) == 2)
  }
  test("zipf sampling skews to head ranks") {
    val cdf = Names.zipfCdf(Names.FirstNames.size, 1.0)
    val draws = (0 until 20000).map(i =>
      Names.zipfIndex(cdf, Hashing.hash01(i.toLong, 5L)))
    val headShare = draws.count(_ < 10).toDouble / draws.size
    val tailShare = draws.count(_ >= 100).toDouble / draws.size
    assert(headShare > 0.4, s"head share $headShare")
    assert(tailShare < headShare)
  }
  test("alpha=0 is uniform-ish") {
    val cdf = Names.zipfCdf(10, 0.0)
    val gaps = cdf.head +: cdf.sliding(2).map { case Array(a, b) => b - a }.toSeq
    assert(gaps.forall(g => math.abs(g - 0.1) < 1e-9))
  }
  test("pick returns pool members") {
    val cdf = Names.zipfCdf(Names.Cities.size, 0.8)
    for (i <- 0 until 200) {
      val v = Names.pick(Names.Cities, cdf, Hashing.hash01(i.toLong, 8L))
      assert(Names.Cities.contains(v))
    }
  }
}
