package repro.mfp

/** MinHash signatures for Jaccard-similarity estimation (Section 4.1).
  *
  * Each of the `h` hash functions maps a set of path ids to the minimum hash
  * value over its members; two sets agree on one signature slot with
  * probability equal to their Jaccard similarity.
  */
object MinHash {

  /** 64-bit mix of (element, function index, seed). */
  private[mfp] def hash(elem: Long, fn: Int, seed: Long): Long = {
    var x = elem ^ (fn.toLong * 0x9E3779B97F4A7C15L) ^ seed
    x ^= x >>> 33; x *= 0xFF51AFD7ED558CCDL
    x ^= x >>> 33; x *= 0xC4CEB9FE1A85EC53L
    x ^= x >>> 33
    x
  }

  /** Signature of a path-id set under `h` hash functions. */
  def signature(pathIds: Iterable[Long], h: Int, seed: Long = 0x5EEDL): Array[Long] = {
    require(pathIds.nonEmpty, "cannot sign an empty set")
    Array.tabulate(h)(fn => pathIds.iterator.map(hash(_, fn, seed)).min)
  }

  /** Fraction of matching signature slots — the Jaccard estimate. */
  def estimate(a: Array[Long], b: Array[Long]): Double = {
    require(a.length == b.length)
    a.indices.count(i => a(i) == b(i)).toDouble / a.length
  }
}
