package repro.core

import org.scalatest.funsuite.AnyFunSuite

class DiscoveryProbabilitySpec extends AnyFunSuite {

  test("probability is 1 while the sample can hold the whole stream") {
    // y = min(k, T) = T → every factor is 1.
    assert(DiscoveryProbability(numEdges = 10, cb = 0, cg = 0, k = 20) === 1.0)
    assert(DiscoveryProbability(numEdges = 20, cb = 0, cg = 0, k = 20) === 1.0)
  }

  test("probability matches the closed form for a saturated sample") {
    // |E| = 100, k = 10: p = (10/100)(9/99)(8/98).
    val expected = (10.0 / 100) * (9.0 / 99) * (8.0 / 98)
    assert(math.abs(DiscoveryProbability(100, 0, 0, 10) - expected) < 1e-15)
  }

  test("compensation counters enter both y and T") {
    // |E| = 50, cb+cg = 10, k = 30: T = 60, y = 30.
    val expected = (30.0 / 60) * (29.0 / 59) * (28.0 / 58)
    assert(math.abs(DiscoveryProbability(50, 4, 6, 30) - expected) < 1e-15)
  }

  test("degenerate tiny streams return the safe value 1") {
    assert(DiscoveryProbability(0, 0, 0, 5) === 1.0)
    assert(DiscoveryProbability(2, 0, 0, 5) === 1.0)
    assert(DiscoveryProbability(100, 0, 0, 2) === 1.0) // y = 2 < 3
  }

  test("probability is monotone increasing in k") {
    val ps = (3 to 50).map(k => DiscoveryProbability(100, 5, 5, k))
    ps.sliding(2).foreach { case Seq(a, b) => assert(a <= b) }
  }

  test("probability never exceeds 1 nor drops to 0 for valid states") {
    for (e <- 3L to 60L; k <- 3 to 30) {
      val p = DiscoveryProbability(e, 1, 2, k)
      assert(p > 0.0 && p <= 1.0, s"e=$e k=$k p=$p")
    }
  }

  test("increment carries the element's sign") {
    assert(DiscoveryProbability.increment(1, 100, 0, 0, 10) > 0)
    assert(DiscoveryProbability.increment(-1, 100, 0, 0, 10) < 0)
    assert(DiscoveryProbability.increment(-1, 100, 0, 0, 10) ===
      -DiscoveryProbability.increment(1, 100, 0, 0, 10))
  }

  test("increment is the reciprocal of the probability") {
    val p = DiscoveryProbability(200, 3, 7, 25)
    assert(math.abs(DiscoveryProbability.increment(1, 200, 3, 7, 25) - 1.0 / p) < 1e-12)
  }
}
