package repro.core

/** Equation 1: the probability that the three specific sample edges needed
  * to discover a butterfly are all present in the Random Pairing sample.
  *
  * `Pr(|E|, c_b, c_g) = y/T · (y−1)/(T−1) · (y−2)/(T−2)` with
  * `T = |E| + c_b + c_g` and `y = min(k, T)`.
  */
object DiscoveryProbability {

  /** Discovery probability for the current RP state.
    *
    * When fewer than three edges can possibly be sampled (`y < 3` or
    * `T < 3`), no butterfly can be discovered through the sample, so the
    * probability is never *used*; we return 1.0 so callers dividing by it
    * stay finite (the multiplying count is 0 in that case).
    */
  def apply(numEdges: Long, cb: Long, cg: Long, k: Int): Double = {
    val t = numEdges + cb + cg
    val y = math.min(k.toLong, t)
    if (y < 3 || t < 3) 1.0
    else
      (y.toDouble / t) * ((y - 1).toDouble / (t - 1)) * ((y - 2).toDouble / (t - 2))
  }

  /** The increment ABACUS adds per discovered butterfly for a stream element
    * with sign `sgn(δ)` (Algorithm 1, line 6): `sgn(δ) / Pr(|E|, c_b, c_g)`.
    */
  def increment(sign: Int, numEdges: Long, cb: Long, cg: Long, k: Int): Double =
    sign / apply(numEdges, cb, cg, k)
}
