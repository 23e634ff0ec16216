package repro.baselines

import org.scalatest.funsuite.AnyFunSuite

class AmsSketchSpec extends AnyFunSuite {

  test("empty sketch estimates zero") {
    assert(new AmsSketch(5, 64, 1L).estimateF2 === 0.0)
  }

  test("a single item with weight w estimates F2 = w²") {
    val s = new AmsSketch(5, 64, 2L)
    s.update(42L, 10L)
    assert(s.estimateF2 === 100.0)
  }

  test("estimate is deterministic in the seed") {
    def make(seed: Long): Double = {
      val s = new AmsSketch(5, 32, seed)
      (1L to 100L).foreach(s.update(_))
      s.estimateF2
    }
    assert(make(3L) === make(3L))
  }

  test("F2 of n distinct unit items is estimated near n") {
    val n = 2000
    val ests = (1 to 20).map { t =>
      val s = new AmsSketch(7, 256, t.toLong)
      (1L to n.toLong).foreach(s.update(_))
      s.estimateF2
    }
    val mean = ests.sum / ests.size
    assert(math.abs(mean - n) < n * 0.25, s"mean F2 estimate $mean for truth $n")
  }

  test("F2 of a skewed multiset is estimated within tolerance") {
    // Frequencies: one item 100 times, 100 items once → F2 = 10000 + 100.
    val truth = 10100.0
    val ests = (1 to 20).map { t =>
      val s = new AmsSketch(7, 256, 100L + t)
      (1 to 100).foreach(_ => s.update(7L))
      (1L to 100L).foreach(i => s.update(1000L + i))
      s.estimateF2
    }
    val mean = ests.sum / ests.size
    assert(math.abs(mean - truth) < truth * 0.3, s"mean $mean truth $truth")
  }

  test("negative weights cancel positive ones") {
    val s = new AmsSketch(5, 64, 4L)
    s.update(9L, 5L)
    s.update(9L, -5L)
    assert(s.estimateF2 === 0.0)
  }

  test("invalid dimensions are rejected") {
    intercept[IllegalArgumentException](new AmsSketch(0, 8, 1L))
    intercept[IllegalArgumentException](new AmsSketch(3, 0, 1L))
  }
}
