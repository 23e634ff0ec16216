package repro.core

/** An undirected edge of a bipartite graph.
  *
  * The two bipartitions are kept in separate ID spaces: `left` always refers
  * to a vertex of the left partition L and `right` to one of the right
  * partition R (paper notation: `u ∈ L`, `v ∈ R`). Equal IDs on opposite
  * sides denote *different* vertices.
  */
final case class Edge(left: Long, right: Long)

/** One element `e^(t) = ({u,v}, δ)` of a fully dynamic bipartite graph
  * stream Π (Definition 1): an edge plus whether it is inserted (`δ = +`)
  * or deleted (`δ = −`).
  */
final case class StreamElement(edge: Edge, isInsert: Boolean) {
  /** `sgn(δ)`: +1 for an insertion, −1 for a deletion (Algorithm 1, line 5). */
  def sign: Int = if (isInsert) 1 else -1
}

object StreamElement {
  /** Convenience constructor for tests and generators. */
  def insert(l: Long, r: Long): StreamElement = StreamElement(Edge(l, r), isInsert = true)

  /** Convenience constructor for tests and generators. */
  def delete(l: Long, r: Long): StreamElement = StreamElement(Edge(l, r), isInsert = false)
}
