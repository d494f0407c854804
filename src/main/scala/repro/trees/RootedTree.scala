package repro.trees

import scala.collection.mutable

/** A rooted, weighted tree over a dense local index with a mapping to
  * global vertex ids — the per-component structure that the F-light
  * machinery of Appendix B (Euler tours, LCA, heavy-light decomposition)
  * operates on.
  *
  * @param ids      global id of each local vertex (ids(0) is the root)
  * @param parent   parent local index (-1 for the root)
  * @param parentW  weight of the edge to the parent (NaN for the root)
  * @param depth    number of edges to the root
  * @param children children lists in BFS order
  */
final class RootedTree private (
    val ids: Array[Long],
    val parent: Array[Int],
    val parentW: Array[Double],
    val depth: Array[Int],
    val children: Array[Array[Int]],
) extends Serializable {
  val n: Int = ids.length

  /** Local index of a global id. */
  @transient lazy val index: Map[Long, Int] = ids.zipWithIndex.toMap

  /** Subtree sizes (number of vertices), computed bottom-up. */
  @transient lazy val subtreeSize: Array[Int] = {
    val size = Array.fill(n)(1)
    // BFS order guarantees children have larger indices in visit order;
    // walk vertices in reverse BFS order instead of relying on that.
    val order = bfsOrder
    var i = order.length - 1
    while (i >= 0) {
      val v = order(i)
      if (parent(v) >= 0) size(parent(v)) += size(v)
      i -= 1
    }
    size
  }

  /** Vertices in BFS order from the root. */
  def bfsOrder: Array[Int] = {
    val order = new Array[Int](n)
    var head = 0; var tail = 0
    order(tail) = 0; tail += 1
    while (head < tail) {
      val v = order(head); head += 1
      children(v).foreach { c => order(tail) = c; tail += 1 }
    }
    order
  }
}

object RootedTree {

  /** Build a rooted tree from an undirected weighted edge list that forms
    * a single tree containing `root`.
    */
  def fromEdges(edges: Seq[(Long, Long, Double)], root: Long): RootedTree = {
    val adj = mutable.LongMap.empty[mutable.ArrayBuffer[(Long, Double)]]
    edges.foreach { case (u, v, w) =>
      adj.getOrElseUpdate(u, mutable.ArrayBuffer.empty) += ((v, w))
      adj.getOrElseUpdate(v, mutable.ArrayBuffer.empty) += ((u, w))
    }
    val n = if (edges.isEmpty) 1 else adj.size
    val ids = new Array[Long](n)
    val parent = Array.fill(n)(-1)
    val parentW = Array.fill(n)(Double.NaN)
    val depth = Array.fill(n)(0)
    val childBuf = Array.fill(n)(mutable.ArrayBuffer.empty[Int])
    val index = mutable.LongMap.empty[Int]

    var tail = 0
    def alloc(id: Long): Int = { val i = tail; ids(i) = id; index(id) = i; tail += 1; i }
    alloc(root)
    var head = 0
    while (head < tail) {
      val vi = head; head += 1
      val vId = ids(vi)
      adj.getOrElse(vId, mutable.ArrayBuffer.empty).foreach { case (uId, w) =>
        if (!index.contains(uId)) {
          val ui = alloc(uId)
          parent(ui) = vi
          parentW(ui) = w
          depth(ui) = depth(vi) + 1
          childBuf(vi) += ui
        }
      }
    }
    require(tail == n, s"edges do not form one tree containing $root ($tail of $n reached)")
    new RootedTree(ids, parent, parentW, depth, childBuf.map(_.toArray))
  }
}
