package repro.mfp

import scala.collection.mutable

/** LSH banding over MinHash signatures (Section 4.1): the signature matrix
  * rows are split into `bands`; edges whose signatures agree on at least one
  * whole band are grouped together (transitively, via union-find), so edges
  * with similar path sets end up in the same MFP-tree.
  */
object Lsh {

  /** Group item ids by banded signature collisions.
    *
    * @param signatures item id → MinHash signature (all the same length)
    * @param bands      number of bands; signature length must be divisible
    * @return disjoint groups covering every item, deterministic order
    */
  def group(signatures: Seq[(Int, Array[Long])], bands: Int): Vector[Vector[Int]] = {
    require(signatures.nonEmpty)
    val h = signatures.head._2.length
    require(h % bands == 0, s"signature length $h not divisible into $bands bands")
    val rowsPerBand = h / bands

    val ids = signatures.map(_._1)
    val idIndex = ids.zipWithIndex.toMap
    val parent = Array.tabulate(ids.size)(identity)
    def find(a: Int): Int = { var x = a; while (parent(x) != x) { parent(x) = parent(parent(x)); x = parent(x) }; x }
    def union(a: Int, b: Int): Unit = { val (ra, rb) = (find(a), find(b)); if (ra != rb) parent(ra) = rb }

    (0 until bands).foreach { b =>
      val buckets = mutable.HashMap.empty[Seq[Long], Int]
      signatures.foreach { case (id, sig) =>
        val key = sig.slice(b * rowsPerBand, (b + 1) * rowsPerBand).toSeq
        buckets.get(key) match {
          case Some(first) => union(idIndex(id), first)
          case None => buckets(key) = idIndex(id)
        }
      }
    }
    ids.indices
      .groupBy(find)
      .toSeq.sortBy(_._2.head)
      .map { case (_, members) => members.map(ids).toVector }
      .toVector
  }
}
