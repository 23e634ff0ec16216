package repro.core

/** Per-edge butterfly counting (Algorithm 1, lines 7–11).
  *
  * For an incoming edge `{u, v}` (u ∈ L, v ∈ R) it counts the butterflies
  * that `{u, v}` forms with the edges of an [[AdjView]]: every butterfly
  * `{u, v, x, w}` (x ∈ L, w ∈ R) discovered requires the three view edges
  * `{u, w}`, `{x, w}`, `{x, v}`.
  *
  * The *cheapest side* heuristic (line 7) picks the endpoint whose
  * view-neighbours have the smaller cumulative degree and drives the set
  * intersections from there; each intersection iterates the smaller of the
  * two neighbour sets and probes the larger, so its cost is the size of the
  * smaller set.
  */
object ButterflyCounter {

  /** Count of butterflies found plus the work (membership probes) spent. */
  final case class Result(butterflies: Long, work: Long)

  /** Count the butterflies the edge `{u, v}` forms with the view.
    *
    * Handles both insertions and deletions: for a deletion the edge itself
    * may still be present in the view, so the endpoints `u`/`v` are excluded
    * from the neighbour sets during intersection (the paper's running
    * example excludes `u` explicitly).
    */
  def countForEdge(view: AdjView, u: Long, v: Long): Result = {
    val nu = view.leftNeighbors(u)  // right-side neighbours of u
    val nv = view.rightNeighbors(v) // left-side neighbours of v

    if (nu.isEmpty || nv.isEmpty) return Result(0L, 0L)

    var cumU = 0L
    nu.foreach(w => cumU += view.rightDegree(w))
    var cumV = 0L
    nv.foreach(x => cumV += view.leftDegree(x))

    var found = 0L
    var work = 0L

    if (cumU <= cumV) {
      // Explore w ∈ N_u^S \ {v}; intersect N_w^S with N_v^S, excluding u.
      val it = nu.iterator
      while (it.hasNext) {
        val w = it.next()
        if (w != v) {
          val packed = intersectCount(view.rightNeighbors(w), nv, exclude = u)
          found += packed >>> 32
          work += packed & 0xFFFFFFFFL
        }
      }
    } else {
      // Symmetric: explore x ∈ N_v^S \ {u}; intersect N_x^S with N_u^S,
      // excluding v.
      val it = nv.iterator
      while (it.hasNext) {
        val x = it.next()
        if (x != u) {
          val packed = intersectCount(view.leftNeighbors(x), nu, exclude = v)
          found += packed >>> 32
          work += packed & 0xFFFFFFFFL
        }
      }
    }
    Result(found, work)
  }

  /** |a ∩ b| excluding one vertex; iterates the smaller set, probes the
    * larger. Returns (count << 32 | probes) to stay allocation-free on the
    * hot path; `probes` (the smaller set's size) is the paper's load metric
    * "checks that happened within the set intersection operations" (§VI-G).
    * Per-intersection count and probes both fit 32 bits because set sizes
    * are bounded by the sample budget.
    */
  private def intersectCount(a: collection.Set[Long], b: collection.Set[Long],
                             exclude: Long): Long = {
    val (small, large) = if (a.size <= b.size) (a, b) else (b, a)
    var c = 0L
    var probes = 0L
    val it = small.iterator
    while (it.hasNext) {
      val x = it.next()
      probes += 1
      if (x != exclude && large.contains(x)) c += 1
    }
    (c << 32) | probes
  }
}
