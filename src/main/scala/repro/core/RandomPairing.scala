package repro.core

import java.util.SplittableRandom
import scala.collection.immutable.ArraySeq

/** Random Pairing (Gemulla et al., VLDBJ'08) over an [[AdjacencySample]] —
  * Algorithm 2 of the paper.
  *
  * Maintains a uniform random sample of at most `k` edges from a fully
  * dynamic stream. Deletions are "paired" with subsequent insertions through
  * the compensation counters:
  *   - `cb` ("bad"): uncompensated deletions of edges that *were* sampled,
  *   - `cg` ("good"): uncompensated deletions of edges that were not.
  *
  * Every mutation of the sample is returned as a sequence of [[SampleDelta]]s
  * so PARABACUS can version the sample; ABACUS ignores them.
  */
final class RandomPairing(val k: Int, val sample: AdjacencySample, rng: SplittableRandom) {
  require(k >= 2, s"memory budget k must be >= 2, got $k")

  /** |E|: number of stream edges currently alive (inserted, not deleted). */
  private var numEdges: Long = 0L
  private var cbCount: Long = 0L
  private var cgCount: Long = 0L

  def streamEdgeCount: Long = numEdges
  def cb: Long = cbCount
  def cg: Long = cgCount

  /** Apply one stream element and return the sample mutations performed. */
  def apply(el: StreamElement): Seq[SampleDelta] =
    if (el.isInsert) insert(el.edge) else delete(el.edge)

  /** Algorithm 2, `InsertToSample`. */
  def insert(e: Edge): Seq[SampleDelta] = {
    numEdges += 1
    if (cbCount + cgCount == 0) {
      if (sample.size < k) {
        ArraySeq(sample.add(e))
      } else if (rng.nextDouble() < k.toDouble / numEdges) {
        val victim = sample.randomEdge(rng)
        ArraySeq(sample.remove(victim), sample.add(e))
      } else Nil
    } else {
      if (rng.nextDouble() < cbCount.toDouble / (cbCount + cgCount)) {
        cbCount -= 1
        ArraySeq(sample.add(e))
      } else {
        cgCount -= 1
        Nil
      }
    }
  }

  /** Algorithm 2, `DeleteFromSample`. */
  def delete(e: Edge): Seq[SampleDelta] = {
    numEdges -= 1
    if (sample.contains(e)) {
      cbCount += 1
      ArraySeq(sample.remove(e))
    } else {
      cgCount += 1
      Nil
    }
  }
}
