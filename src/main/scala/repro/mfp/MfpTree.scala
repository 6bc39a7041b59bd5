package repro.mfp

import scala.collection.mutable

/** Modified FP-tree (Section 4.2) compressing the path sets of one LSH group
  * of edges.
  *
  * Each edge's (frequency-ranked) path set plus the edge itself forms a node
  * sequence `⟨p₀ … p_l, e⟩`; insertion finds the longest matching prefix of
  * that sequence **starting at any node** (not only the root — the paper's
  * departure from the classic FP-tree) and appends the remainder there. The
  * tail node records `|P|` so the path set can be recovered by walking up
  * exactly `|P|` ancestors.
  */
final class MfpTree extends Serializable {

  /** `pathId >= 0` labels a normal node; tail nodes carry `pathId == -1`
    * and the owning edge id plus the recorded set size.
    */
  final class Node(val pathId: Long, val edgeId: Int, val setSize: Int) extends Serializable {
    var parent: Node = _
    val children: mutable.ArrayBuffer[Node] = mutable.ArrayBuffer.empty
    def isTail: Boolean = pathId == -1L
  }

  val root: Node = new Node(-2L, -1, 0)
  /** All normal nodes labelled with a given path id (prefix-search index). */
  private val nodesOfPath = mutable.HashMap.empty[Long, mutable.ArrayBuffer[Node]]
  /** Edge id → its unique tail node. */
  private val tailOfEdge = mutable.HashMap.empty[Int, Node]

  def nodeCount: Int = {
    def count(n: Node): Int = 1 + n.children.iterator.map(count).sum
    count(root) - 1 // exclude the empty root
  }

  def edges: Seq[Int] = tailOfEdge.keys.toSeq.sorted

  /** Insert one edge with its ranked path-id sequence. */
  def insert(edgeId: Int, rankedPathIds: Seq[Long]): Unit = {
    require(rankedPathIds.nonEmpty, s"edge $edgeId has no paths")
    require(!tailOfEdge.contains(edgeId), s"edge $edgeId inserted twice")
    // Longest matching prefix starting anywhere: candidate start nodes are
    // the existing nodes labelled rankedPathIds.head; extend greedily.
    var bestStart: Node = null
    var bestLen = 0
    nodesOfPath.getOrElse(rankedPathIds.head, mutable.ArrayBuffer.empty).foreach { start =>
      var cur = start
      var len = 1
      var ok = true
      while (ok && len < rankedPathIds.length) {
        cur.children.find(c => !c.isTail && c.pathId == rankedPathIds(len)) match {
          case Some(next) => cur = next; len += 1
          case None => ok = false
        }
      }
      if (len > bestLen) { bestLen = len; bestStart = cur }
    }
    var attach: Node = if (bestLen == 0) root else bestStart
    rankedPathIds.drop(bestLen).foreach { pid =>
      val n = new Node(pid, -1, 0)
      n.parent = attach
      attach.children += n
      nodesOfPath.getOrElseUpdate(pid, mutable.ArrayBuffer.empty) += n
      attach = n
    }
    val tail = new Node(-1L, edgeId, rankedPathIds.length)
    tail.parent = attach
    attach.children += tail
    tailOfEdge(edgeId) = tail
  }

  /** Recover the path set of an edge by walking up `|P|` ancestors. */
  def pathSetOf(edgeId: Int): Set[Long] = {
    val tail = tailOfEdge.getOrElse(edgeId, sys.error(s"edge $edgeId not in tree"))
    var cur = tail.parent
    val out = Set.newBuilder[Long]
    var steps = 0
    while (steps < tail.setSize) {
      require(cur != null && cur.pathId >= 0, s"broken ancestor chain for edge $edgeId")
      out += cur.pathId
      cur = cur.parent
      steps += 1
    }
    out.result()
  }

  def containsEdge(edgeId: Int): Boolean = tailOfEdge.contains(edgeId)
}

object MfpTree {
  /** Build one tree from a group of edges: rank each edge's path set by the
    * paths' global occurrence counts (descending, ties by id) and insert in
    * descending set-size order so long chains form first.
    */
  def build(group: Seq[(Int, Seq[Long])], occurrences: Map[Long, Int]): MfpTree = {
    val tree = new MfpTree
    def rank(pids: Seq[Long]): Seq[Long] =
      pids.distinct.sortBy(p => (-occurrences.getOrElse(p, 0), p))
    group.sortBy { case (_, pids) => (-pids.size, pids.headOption.getOrElse(0L)) }
      .foreach { case (e, pids) => tree.insert(e, rank(pids)) }
    tree
  }
}
