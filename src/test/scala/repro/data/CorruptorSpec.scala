package repro.data

import org.scalatest.funsuite.AnyFunSuite

class CorruptorSpec extends AnyFunSuite {

  test("edit1 is deterministic in its seed") {
    assert(Corruptor.edit1("jennifer", 7L) == Corruptor.edit1("jennifer", 7L))
  }
  test("edit1 varies with seed") {
    val outs = (0L until 50L).map(s => Corruptor.edit1("jennifer", s)).distinct
    assert(outs.size > 5)
  }
  test("edit1 of empty/null is identity") {
    assert(Corruptor.edit1("", 1L) == "")
    assert(Corruptor.edit1(null, 1L) == null)
  }
  test("edit1 changes length by at most 1") {
    for (s <- 0L until 200L) {
      val out = Corruptor.edit1("martinez", s)
      assert(math.abs(out.length - 8) <= 1, s"seed=$s out=$out")
    }
  }
  test("edit1 usually changes the string") {
    val changed = (0L until 200L).count(s => Corruptor.edit1("martinez", s) != "martinez")
    assert(changed > 150, s"only $changed/200 changed")
  }
  test("edits(n=0) is identity") {
    assert(Corruptor.edits("smith", 0, 3L) == "smith")
  }
  test("edits grows damage with n") {
    // distance from original should (weakly) grow with edit count
    def dist(a: String, b: String): Int = {
      val d = Array.tabulate(a.length + 1, b.length + 1)((i, j) => if (i == 0) j else if (j == 0) i else 0)
      for (i <- 1 to a.length; j <- 1 to b.length)
        d(i)(j) = math.min(math.min(d(i - 1)(j) + 1, d(i)(j - 1) + 1),
                           d(i - 1)(j - 1) + (if (a(i - 1) == b(j - 1)) 0 else 1))
      d(a.length)(b.length)
    }
    val base = "alexandria"
    val d1 = (0L until 50L).map(s => dist(base, Corruptor.edits(base, 1, s))).sum
    val d4 = (0L until 50L).map(s => dist(base, Corruptor.edits(base, 4, s))).sum
    assert(d4 > d1)
  }

  test("corruptRecord at rate 0 is identity") {
    for (e <- 0L until 100L) {
      val out = Corruptor.corruptRecord("ann", "lee", "19800101", "salem", e, 5L, 0.0, 2)
      assert(out == (("ann", "lee", "19800101", "salem")))
    }
  }
  test("corruptRecord at rate 1 always corrupts something") {
    val changed = (0L until 100L).count { e =>
      Corruptor.corruptRecord("jennifer", "martinez", "19800101", "springfield",
                              e, 5L, 1.0, 2) !=
        (("jennifer", "martinez", "19800101", "springfield"))
    }
    assert(changed >= 97, s"changed=$changed")
  }
  test("corruptRecord rate ~ fraction corrupted") {
    val n = 2000
    val changed = (0L until n.toLong).count { e =>
      Corruptor.corruptRecord("jennifer", "martinez", "19800101", "springfield",
                              e, 9L, 0.3, 2) !=
        (("jennifer", "martinez", "19800101", "springfield"))
    }
    val frac = changed.toDouble / n
    assert(math.abs(frac - 0.3) < 0.05, s"frac=$frac")
  }
  test("corruptRecord deterministic in (entId, salt)") {
    val a = Corruptor.corruptRecord("ann", "lee", "19800101", "salem", 17L, 5L, 1.0, 2)
    val b = Corruptor.corruptRecord("ann", "lee", "19800101", "salem", 17L, 5L, 1.0, 2)
    assert(a == b)
  }
  test("different salts corrupt differently") {
    val outs = (0L until 50L).map(salt =>
      Corruptor.corruptRecord("jennifer", "martinez", "19800101", "springfield",
                              1L, salt, 1.0, 2)).distinct
    assert(outs.size > 10)
  }
  test("dob stays 8 chars under corruption") {
    for (e <- 0L until 200L) {
      val (_, _, d, _) = Corruptor.corruptRecord("ann", "lee", "19800101", "salem",
                                                 e, 5L, 1.0, 3)
      assert(d.length == 8, s"e=$e dob=$d")
    }
  }
  test("some corrupted records swap names") {
    val swapped = (0L until 500L).count { e =>
      val (f, l, _, _) = Corruptor.corruptRecord("aaaa", "bbbb", "19800101", "salem",
                                                 e, 5L, 1.0, 1)
      f.startsWith("bbb") || l.startsWith("aaa")
    }
    assert(swapped > 10 && swapped < 150, s"swapped=$swapped")
  }
}
