package repro.core

/** Shared graph-stream types for the Neighborhood Detection reproduction.
  *
  * The paper's universe: a bipartite graph G = (A, B, E) with |A| = n and
  * |B| = m = poly n. Items of a frequency stream map to A-vertices and
  * their witnesses (timestamps, user ids, ...) map to B-vertices, so an
  * item occurrence is an edge insertion.
  */

/** A directed bipartite edge a -> b (a in A = items, b in B = witnesses). */
final case class Edge(a: Long, b: Long)

/** A turnstile stream event: `delta` is +1 (insert) or -1 (delete). */
final case class StreamOp(edge: Edge, delta: Int) {
  require(delta == 1 || delta == -1, s"delta must be +-1, got $delta")
}

/** A reported neighborhood: vertex `a` together with a set of neighbors.
  *
  * `size` is |neighbors| per the paper's |(a, S)| = |S| convention.
  */
final case class Neighborhood(a: Long, neighbors: Vector[Long]) {
  def size: Int = neighbors.size
}

object Neighborhood {
  /** Validity check against a ground-truth adjacency: every reported
    * neighbor must be a true neighbor and neighbors must be distinct.
    */
  def isValid(nb: Neighborhood, adjacency: Map[Long, Set[Long]]): Boolean = {
    val truth = adjacency.getOrElse(nb.a, Set.empty)
    nb.neighbors.distinct.size == nb.neighbors.size && nb.neighbors.forall(truth.contains)
  }
}
