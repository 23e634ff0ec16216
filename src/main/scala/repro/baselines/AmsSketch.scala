package repro.baselines

import java.util.SplittableRandom

/** AMS (Alon–Matias–Szegedy) F2 sketch — the sketching substrate of the
  * CAS baseline (Li et al., TKDE'22 use AMS sketches alongside their edge
  * sample; λ of the memory budget goes to the sketch).
  *
  * `rows × cols` counters; each row r has a 4-wise-independent ±1 hash
  * ξ_r and a bucket hash h_r. `update(x, w)` adds `w·ξ_r(x)` to bucket
  * `h_r(x)`; `estimateF2` is the median over rows of Σ_b counter².
  *
  * @param rows number of independent estimators (median across them)
  * @param cols buckets per row; total space is rows·cols counters
  */
final class AmsSketch(rows: Int, cols: Int, seed: Long) {
  require(rows >= 1 && cols >= 1, "sketch dimensions must be positive")

  private val table = Array.ofDim[Long](rows, cols)
  // Coefficients of degree-3 polynomials over a Mersenne prime give
  // 4-wise independence for both the sign and the bucket hash.
  private val P = (1L << 61) - 1
  private val coef: Array[Array[Long]] = {
    val rng = new SplittableRandom(seed)
    Array.fill(rows, 8)((rng.nextLong() & Long.MaxValue) % P)
  }

  private def poly(r: Int, off: Int, x: Long): Long = {
    val c = coef(r)
    var acc = c(off)
    var i = 1
    while (i < 4) {
      acc = mulmod(acc, x) + c(off + i)
      if (acc >= P) acc -= P
      i += 1
    }
    acc
  }

  private def mulmod(a: Long, b: Long): Long = {
    // 61-bit modular multiplication via 128-bit intermediate.
    val hi = Math.multiplyHigh(a, b)
    val lo = a * b
    val res = ((hi << 3) | (lo >>> 61)) + (lo & P)
    if (res >= P) res - P else res
  }

  /** Add weight `w` for item `x`. */
  def update(x: Long, w: Long = 1L): Unit = {
    val xx = (x & Long.MaxValue) % P
    var r = 0
    while (r < rows) {
      val sign = if ((poly(r, 0, xx) & 1L) == 1L) 1L else -1L
      val bucket = (poly(r, 4, xx) % cols).toInt
      table(r)(bucket) += sign * w
      r += 1
    }
  }

  /** Estimate of F2 = Σ_x f_x² (median of row estimates). */
  def estimateF2: Double = {
    val ests = Array.tabulate(rows) { r =>
      var s = 0.0
      var b = 0
      while (b < cols) { val v = table(r)(b).toDouble; s += v * v; b += 1 }
      s
    }
    java.util.Arrays.sort(ests)
    if (rows % 2 == 1) ests(rows / 2)
    else (ests(rows / 2 - 1) + ests(rows / 2)) / 2.0
  }
}
