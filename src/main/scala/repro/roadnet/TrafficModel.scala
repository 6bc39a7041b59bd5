package repro.roadnet

import repro.core.{WeightUpdate, WeightedGraph}

/** Dynamic travel-time model (Section 6.2, after Fleischmann et al. [5]).
  *
  * At each snapshot an `alpha` fraction of the edges change weight; the
  * multiplicative variation is drawn uniformly from `[-tau, +tau]` around the
  * current weight, clamped to `[0.2·w⁰, 5·w⁰]` so travel times stay positive
  * and within a plausible congestion envelope. Selection and variation are
  * deterministic in (edgeId, round, seed): the same experiment replays
  * identically on Spark workers and in the DuckDB oracle.
  */
object TrafficModel {

  /** Mix-down hash → uniform double in [0, 1). */
  private def u01(edgeId: Int, round: Int, seed: Long, stream: Int): Double = {
    var x = seed ^ (edgeId.toLong * 0x9E3779B97F4A7C15L) ^ (round.toLong << 32) ^ (stream.toLong << 17)
    x ^= x >>> 33; x *= 0xFF51AFD7ED558CCDL
    x ^= x >>> 33; x *= 0xC4CEB9FE1A85EC53L
    x ^= x >>> 33
    (x >>> 11).toDouble / (1L << 53).toDouble
  }

  /** Compute (without applying) the update batch for one snapshot.
    *
    * @param g     current graph (weights read, not written)
    * @param alpha fraction of edges changing weight (paper default 0.35)
    * @param tau   variation range (paper default 0.30)
    * @param round snapshot index — vary it to advance time
    */
  def snapshot(g: WeightedGraph, alpha: Double, tau: Double, round: Int, seed: Long = 7L): Seq[WeightUpdate] = {
    val out = Seq.newBuilder[WeightUpdate]
    var e = 0
    while (e < g.numEdges) {
      if (u01(e, round, seed, 0) < alpha) {
        val factor = 1.0 + (2.0 * u01(e, round, seed, 1) - 1.0) * tau
        val w0 = g.initialWeights(e)
        val nw0 = math.max(0.2 * w0, math.min(5.0 * w0, g.weights(e) * factor))
        val nw = math.max(0.01, nw0)
        if (nw != g.weights(e)) out += WeightUpdate(e, nw, nw - g.weights(e))
      }
      e += 1
    }
    out.result()
  }

  /** Apply `rounds` consecutive snapshots to `g` in place; returns all batches. */
  def evolve(g: WeightedGraph, alpha: Double, tau: Double, rounds: Int, seed: Long = 7L): Seq[Seq[WeightUpdate]] =
    (1 to rounds).map { r =>
      val batch = snapshot(g, alpha, tau, r, seed)
      g.applyUpdates(batch)
      batch
    }
}
