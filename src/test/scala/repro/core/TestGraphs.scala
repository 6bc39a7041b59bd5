package repro.core

import scala.collection.mutable
import scala.util.Random

/** Shared test fixtures: small deterministic graphs plus brute-force
  * reference algorithms (exhaustive simple-path enumeration, walk-level DP)
  * that the real implementations are checked against.
  */
object TestGraphs {

  /** Connected random graph: a random spanning tree plus `extraEdges` random
    * chords, integer weights in [1, maxW]. Deterministic in (n, seed).
    */
  def randomConnected(n: Int, extraEdges: Int, seed: Long, maxW: Int = 20): WeightedGraph = {
    require(n >= 2)
    val rnd = new Random(seed)
    val edges = mutable.LinkedHashSet.empty[(Int, Int)]
    val order = rnd.shuffle((0 until n).toVector)
    for (i <- 1 until n) {
      val a = order(i)
      val b = order(rnd.nextInt(i))
      edges += (if (a < b) (a, b) else (b, a))
    }
    var attempts = 0
    while (edges.size < n - 1 + extraEdges && attempts < 50 * extraEdges) {
      val a = rnd.nextInt(n); val b = rnd.nextInt(n)
      if (a != b) edges += (if (a < b) (a, b) else (b, a))
      attempts += 1
    }
    WeightedGraph.fromEdges(n, edges.toSeq.map { case (a, b) => (a, b, (1 + rnd.nextInt(maxW)).toDouble) })
  }

  /** w × h grid graph with integer weights in [1, maxW]. */
  def grid(w: Int, h: Int, seed: Long, maxW: Int = 20): WeightedGraph = {
    val rnd = new Random(seed)
    val edges = mutable.ArrayBuffer.empty[(Int, Int, Double)]
    def vid(x: Int, y: Int) = y * w + x
    for (y <- 0 until h; x <- 0 until w) {
      if (x + 1 < w) edges += ((vid(x, y), vid(x + 1, y), (1 + rnd.nextInt(maxW)).toDouble))
      if (y + 1 < h) edges += ((vid(x, y), vid(x, y + 1), (1 + rnd.nextInt(maxW)).toDouble))
    }
    WeightedGraph.fromEdges(w * h, edges.toSeq)
  }

  /** All simple paths s→t by DFS — exponential; only for tiny graphs. */
  def allSimplePaths(g: WeightedGraph, s: Int, t: Int): Seq[Path] = {
    val out = mutable.ArrayBuffer.empty[Path]
    val onPath = new Array[Boolean](g.numVertices)
    val vs = mutable.ArrayBuffer(s)
    val es = mutable.ArrayBuffer.empty[Int]
    def dfs(v: Int, dist: Double): Unit = {
      if (v == t) { out += Path(vs.toVector, es.toVector, dist); return }
      g.foreachNeighbor(v) { (u, e) =>
        if (!onPath(u)) {
          onPath(u) = true; vs += u; es += e
          dfs(u, dist + g.weights(e))
          onPath(u) = false; vs.remove(vs.size - 1); es.remove(es.size - 1)
        }
      }
    }
    onPath(s) = true
    dfs(s, 0.0)
    out.toSeq
  }

  /** Exhaustive k shortest simple paths (ties broken by vertex sequence). */
  def bruteKsp(g: WeightedGraph, s: Int, t: Int, k: Int): Seq[Path] =
    allSimplePaths(g, s, t).sortBy(p => (p.distance, p.vertices.mkString(","))).take(k)

  /** Exact min walk distance per vfrag level up to `maxPhi`, by DP:
    * `d[v][phi] = min over edges (u,v) of d[u][phi - c] + w`. Reference for
    * [[LevelDijkstra]].
    */
  def walkLevelDp(g: WeightedGraph, s: Int, maxPhi: Int): Array[Array[Double]] = {
    val d = Array.fill(g.numVertices, maxPhi + 1)(Double.PositiveInfinity)
    d(s)(0) = 0.0
    for (phi <- 1 to maxPhi; v <- 0 until g.numVertices) {
      g.foreachNeighbor(v) { (u, e) =>
        val c = g.vfrags(e)
        if (phi - c >= 0 && d(u)(phi - c).isFinite)
          d(v)(phi) = math.min(d(v)(phi), d(u)(phi - c) + g.weights(e))
      }
    }
    d
  }

  /** Distances of the k shortest paths, rounded for stable comparison. */
  def distances(paths: Seq[Path]): Seq[Double] = paths.map(p => math.rint(p.distance * 1e6) / 1e6)
}
