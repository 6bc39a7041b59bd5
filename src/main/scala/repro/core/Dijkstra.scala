package repro.core

import scala.collection.mutable

/** A simple path (or walk) in a [[WeightedGraph]].
  *
  * @param vertices vertex sequence, source first
  * @param edgeIds  edge ids between consecutive vertices (`vertices.size - 1` of them)
  * @param distance total weight under the weight function used to find it
  */
final case class Path(vertices: Vector[Int], edgeIds: Vector[Int], distance: Double) {
  def source: Int = vertices.head
  def target: Int = vertices.last
  def isSimple: Boolean = vertices.distinct.size == vertices.size
  /** Concatenate with a path starting at this path's target. */
  def ++(that: Path): Path = {
    require(target == that.source, s"cannot join $target -> ${that.source}")
    Path(vertices ++ that.vertices.tail, edgeIds ++ that.edgeIds, distance + that.distance)
  }
  /** Re-price this path under the graph's current weights. */
  def repriced(g: WeightedGraph): Path = copy(distance = edgeIds.map(g.weights).sum)
}

/** Dijkstra's algorithm with optional vertex/edge bans and a pluggable edge
  * weight function (real weights for distances, vfrag counts for bounding
  * paths). Vertex bans never apply to the source or the target, which lets
  * callers forbid boundary-vertex interiors (Section 5.2 refine step).
  */
object Dijkstra {

  /** Result of a single-source run: `dist(v)` is `Double.PositiveInfinity`
    * for unreachable vertices; `parentEdge`/`parentVertex` reconstruct paths.
    */
  final class Result(val dist: Array[Double], val parentVertex: Array[Int], val parentEdge: Array[Int]) {
    def pathTo(t: Int): Option[Path] = {
      if (dist(t).isInfinite) None
      else {
        var v = t
        val vs = List.newBuilder[Int]
        val es = List.newBuilder[Int]
        val vrev = mutable.ArrayBuffer.empty[Int]
        val erev = mutable.ArrayBuffer.empty[Int]
        while (v >= 0) {
          vrev += v
          if (parentVertex(v) >= 0) erev += parentEdge(v)
          v = parentVertex(v)
        }
        vs ++= vrev.reverseIterator
        es ++= erev.reverseIterator
        Some(Path(vs.result().toVector, es.result().toVector, dist(t)))
      }
    }
  }

  /** Single-source shortest paths.
    *
    * @param g            the graph
    * @param source       start vertex
    * @param target       if `>= 0`, stop as soon as `target` is settled
    * @param bannedVertex vertices that may not appear (except source/target)
    * @param bannedEdge   edges that may not be used
    * @param weightOf     edge id → weight (defaults to current real weights)
    * @param heuristic    optional consistent lower bound on the remaining
    *                     distance to `target` (turns the search into A*);
    *                     vertices with an infinite heuristic are pruned
    * @param noTransit    vertices that may be *reached* (settled) but never
    *                     expanded through (the source always expands) —
    *                     interior-free search semantics
    */
  def run(
      g: GraphOps,
      source: Int,
      target: Int = -1,
      bannedVertex: Int => Boolean = _ => false,
      bannedEdge: Int => Boolean = _ => false,
      weightOf: Int => Double = null,
      heuristic: Int => Double = null,
      noTransit: Int => Boolean = _ => false): Result = {
    val w: Int => Double = if (weightOf == null) g.edgeWeight else weightOf
    val h: Int => Double = if (heuristic == null || target < 0) _ => 0.0 else heuristic
    val n = g.numVertices
    val dist = Array.fill(n)(Double.PositiveInfinity)
    val pv = Array.fill(n)(-1)
    val pe = Array.fill(n)(-1)
    val settled = new Array[Boolean](n)
    // (dist + h, vertex) min-heap; with h == 0 this is plain Dijkstra.
    val pq = mutable.PriorityQueue.empty[(Double, Int)](Ordering.by[(Double, Int), Double](_._1).reverse)
    dist(source) = 0.0
    pq.enqueue((h(source), source))
    while (pq.nonEmpty) {
      val (_, v) = pq.dequeue()
      if (!settled(v)) {
        settled(v) = true
        if (v == target) return new Result(dist, pv, pe)
        // A banned vertex may be *entered* only if it is the target; it is
        // never expanded further unless it is the source. No-transit
        // vertices settle normally but stop the search locally.
        if (!(bannedVertex(v) && v != source) && (v == source || !noTransit(v))) {
          val d = dist(v)
          g.foreachNeighbor(v) { (u, e) =>
            if (!settled(u) && !bannedEdge(e) && !(bannedVertex(u) && u != target)) {
              val nd = d + w(e)
              if (nd < dist(u)) {
                val hu = h(u)
                if (!hu.isInfinite) {
                  dist(u) = nd; pv(u) = v; pe(u) = e
                  pq.enqueue((nd + hu, u))
                }
              }
            }
          }
        }
      }
    }
    new Result(dist, pv, pe)
  }

  /** Shortest path from `s` to `t`, if any. */
  def shortestPath(
      g: GraphOps,
      s: Int,
      t: Int,
      bannedVertex: Int => Boolean = _ => false,
      bannedEdge: Int => Boolean = _ => false,
      weightOf: Int => Double = null,
      heuristic: Int => Double = null): Option[Path] =
    run(g, s, t, bannedVertex, bannedEdge, weightOf, heuristic).pathTo(t)
}
