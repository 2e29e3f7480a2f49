package repro.core

import org.scalatest.funsuite.AnyFunSuite

class HashingSpec extends AnyFunSuite {

  test("splitmix64 is deterministic") {
    assert(Hashing.splitmix64(42L) == Hashing.splitmix64(42L))
  }
  test("splitmix64 differs on nearby inputs") {
    assert(Hashing.splitmix64(1L) != Hashing.splitmix64(2L))
  }
  test("mix depends on both arguments") {
    assert(Hashing.mix(1L, 2L) != Hashing.mix(1L, 3L))
    assert(Hashing.mix(1L, 2L) != Hashing.mix(2L, 2L))
  }
  test("hash01 in [0,1)") {
    for (x <- -1000L to 1000L) {
      val u = Hashing.hash01(x, 7L)
      assert(u >= 0.0 && u < 1.0, s"x=$x u=$u")
    }
  }
  test("hash01 is roughly uniform") {
    val n = 20000
    val mean = (0 until n).map(i => Hashing.hash01(i.toLong, 99L)).sum / n
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
  }
  test("hashInt in range and covers values") {
    val vals = (0 until 5000).map(i => Hashing.hashInt(i.toLong, 3L, 10))
    assert(vals.forall(v => v >= 0 && v < 10))
    assert(vals.distinct.size == 10)
  }
  test("hashInt rejects non-positive n") {
    assertThrows[IllegalArgumentException](Hashing.hashInt(1L, 1L, 0))
  }
  test("tokenHash keyed by secret") {
    assert(Hashing.tokenHash("ab", "s1", 0) != Hashing.tokenHash("ab", "s2", 0))
  }
  test("tokenHash keyed by seed index") {
    assert(Hashing.tokenHash("ab", "s", 0) != Hashing.tokenHash("ab", "s", 1))
  }
  test("tokenHashMod in [0, m)") {
    for (i <- 0 until 1000) {
      val h = Hashing.tokenHashMod(s"tok$i", "s", 3, 97)
      assert(h >= 0 && h < 97)
    }
  }
  test("hmacSha256Hex known vector") {
    // RFC 4231 test case 2: key "Jefe", data "what do ya want for nothing?"
    assert(Hashing.hmacSha256Hex("what do ya want for nothing?", "Jefe") ==
      "5bdcc146bf60754e6a042426089575c75a003f089d2739839dec58b964ec3843")
  }
  test("hmac differs under different keys") {
    assert(Hashing.hmacSha256Hex("v", "k1") != Hashing.hmacSha256Hex("v", "k2"))
  }
  test("hmac is 64 hex chars") {
    val h = Hashing.hmacSha256Hex("value", "key")
    assert(h.length == 64 && h.forall(c => "0123456789abcdef".contains(c)))
  }
}
