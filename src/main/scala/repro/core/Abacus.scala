package repro.core

import java.util.SplittableRandom

/** ABACUS (Algorithm 1): approximate butterfly counting over a fully
  * dynamic bipartite graph stream.
  *
  * For every arriving element it (1) counts the butterflies the element's
  * edge forms with the current Random Pairing sample and refines the
  * estimate by `sgn(δ)/Pr(|E|, c_b, c_g)` per butterfly, then (2) applies
  * the Random Pairing sample update. Space is O(k); time is O(k² t) for t
  * elements (Theorems 3, 4).
  *
  * @param k    memory budget: maximum number of sampled edges (≥ 2)
  * @param seed seed for the sampling RNG — runs are deterministic in
  *             (stream, k, seed), which the PARABACUS equivalence tests rely on
  */
final class Abacus(val k: Int, seed: Long) {
  private val sample = new AdjacencySample
  private val rp = new RandomPairing(k, sample, new SplittableRandom(seed))

  private var est: Double = 0.0
  private var processedCount: Long = 0L
  private var totalWorkCount: Long = 0L
  private var totalFoundCount: Long = 0L

  /** Current butterfly count estimate c. */
  def estimate: Double = est

  /** Elements processed so far. */
  def processed: Long = processedCount

  /** Total set-intersection probes spent (workload metric, §VI-G). */
  def totalWork: Long = totalWorkCount

  /** Total butterflies discovered through the sample (pre-extrapolation). */
  def totalFound: Long = totalFoundCount

  /** Current sample size |S|. */
  def sampleSize: Int = sample.size

  /** Live stream edge count |E| (for tests of the RP bookkeeping). */
  def streamEdgeCount: Long = rp.streamEdgeCount

  /** Process one stream element: refine the count, then update the sample. */
  def process(el: StreamElement): Unit = {
    // Increment uses the RP state *before* this element's sample update
    // (Appendix B uses p^{(s-1)}).
    val r = ButterflyCounter.countForEdge(sample, el.edge.left, el.edge.right)
    totalWorkCount += r.work
    if (r.butterflies > 0) {
      val inc = DiscoveryProbability.increment(
        el.sign, rp.streamEdgeCount, rp.cb, rp.cg, k)
      est += r.butterflies * inc
      totalFoundCount += r.butterflies
    }
    rp.apply(el)
    processedCount += 1
  }

  /** Process a whole stream (convenience for tests and benchmarks). */
  def processAll(stream: IterableOnce[StreamElement]): Double = {
    stream.iterator.foreach(process)
    est
  }
}
