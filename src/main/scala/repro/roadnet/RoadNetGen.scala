package repro.roadnet

import repro.core.WeightedGraph
import scala.collection.mutable
import scala.util.Random

/** Synthetic road networks standing in for the DIMACS datasets (NY, COL,
  * FLA, CUSA travel-time graphs), which are unavailable offline.
  *
  * Construction: lay vertices on a W×H grid, carve a uniform random spanning
  * tree (so the network is connected, like a road network), then add each
  * remaining grid edge independently with probability `extraEdgeProb`.
  * The result is sparse (~2.4–3 average degree), near-planar, and has the
  * long-diameter structure that makes BFS partitioning and boundary-vertex
  * counts behave like real road networks. Travel times are integers in
  * [minTime, maxTime] so vfrag counts (Section 3.4) are well defined.
  *
  * Everything is deterministic in (vertices, seed).
  */
object RoadNetGen {

  /** Named scaled-down counterparts of the paper's datasets (DESIGN.md §7). */
  final case class NetworkConfig(name: String, vertices: Int, defaultZ: Int, paperVertices: Int, paperZ: Int)

  val NyLite: NetworkConfig   = NetworkConfig("NY-lite", 13217, 50, 264346, 200)
  val ColLite: NetworkConfig  = NetworkConfig("COL-lite", 21783, 50, 435666, 200)
  val FlaLite: NetworkConfig  = NetworkConfig("FLA-lite", 26760, 125, 1070376, 500)
  val CusaLite: NetworkConfig = NetworkConfig("CUSA-lite", 70409, 250, 14081816, 1000)
  val all: Seq[NetworkConfig] = Seq(NyLite, ColLite, FlaLite, CusaLite)

  /** Generate a connected road-like network with ~`vertices` vertices. */
  def generate(
      vertices: Int,
      seed: Long = 42L,
      extraEdgeProb: Double = 0.55,
      minTime: Int = 5,
      maxTime: Int = 100): WeightedGraph = {
    require(vertices >= 2)
    val w = math.max(2, math.ceil(math.sqrt(vertices.toDouble)).toInt)
    val h = math.max(2, math.ceil(vertices.toDouble / w).toInt)
    val n = w * h
    val rnd = new Random(seed)

    def vid(x: Int, y: Int): Int = y * w + x

    // All grid edges (4-neighborhood).
    val gridEdges = mutable.ArrayBuffer.empty[(Int, Int)]
    for (y <- 0 until h; x <- 0 until w) {
      if (x + 1 < w) gridEdges += ((vid(x, y), vid(x + 1, y)))
      if (y + 1 < h) gridEdges += ((vid(x, y), vid(x, y + 1)))
    }

    // Randomized-Kruskal spanning tree over a shuffled edge order.
    val order = rnd.shuffle(gridEdges.toVector)
    val parent = Array.tabulate(n)(identity)
    def find(a: Int): Int = { var x = a; while (parent(x) != x) { parent(x) = parent(parent(x)); x = parent(x) }; x }
    val chosen = mutable.LinkedHashSet.empty[(Int, Int)]
    order.foreach { case (a, b) =>
      val (ra, rb) = (find(a), find(b))
      if (ra != rb) { parent(ra) = rb; chosen += ((a, b)) }
    }
    // Extra edges for alternative routes (k shortest paths need them).
    order.foreach { e => if (!chosen.contains(e) && rnd.nextDouble() < extraEdgeProb) chosen += e }

    val triples = chosen.toSeq.map { case (a, b) =>
      (a, b, (minTime + rnd.nextInt(maxTime - minTime + 1)).toDouble)
    }
    WeightedGraph.fromEdges(n, triples)
  }

  def generate(cfg: NetworkConfig): WeightedGraph = generate(cfg.vertices, seed = cfg.name.hashCode.toLong)
}
