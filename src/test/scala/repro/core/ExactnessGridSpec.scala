package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestGraphs

/** Grid of deterministic end-to-end exactness checks: with a budget that
  * covers the whole stream, ABACUS's estimate must equal the exact count at
  * the end of every configuration — across graph shapes, sizes and deletion
  * ratios. One named test per configuration keeps failures localised.
  */
class ExactnessGridSpec extends AnyFunSuite {

  private val grid = for {
    (nL, nR) <- Seq((6, 6), (10, 4), (4, 10), (20, 20), (8, 30))
    m <- Seq(20, 60)
    alpha <- Seq(0.0, 0.2, 0.5)
    if m <= nL * nR
  } yield (nL, nR, m, alpha)

  grid.foreach { case (nL, nR, m, alpha) =>
    test(s"abacus with full budget is exact: nL=$nL nR=$nR m=$m alpha=$alpha") {
      val stream = TestGraphs.randomStream(nL, nR, m, alpha, seed = (nL * 31 + nR) * 17 + m)
      val abacus = new Abacus(k = 10 * (m + 1), seed = 1L)
      abacus.processAll(stream)
      val exact = new ExactButterflyCounter
      exact.processAll(stream)
      assert(math.abs(abacus.estimate - exact.count) < 1e-6,
        s"estimate=${abacus.estimate} exact=${exact.count}")
    }
  }

  grid.foreach { case (nL, nR, m, alpha) =>
    test(s"estimate is seed-stable: nL=$nL nR=$nR m=$m alpha=$alpha k=8") {
      val stream = TestGraphs.randomStream(nL, nR, m, alpha, seed = 99L)
      def run() = new Abacus(k = 8, seed = 5L).processAll(stream)
      assert(run() === run())
    }
  }
}
