package repro.trees

/** Heavy-light decomposition with maximum-edge-weight path queries
  * (Appendix B). Each non-leaf marks the edge to its largest-subtree
  * child heavy; heavy edges form disjoint chains laid out contiguously in
  * a base array, so any root-to-vertex path decomposes into O(log n)
  * chain segments, each answerable by one RMQ (Algorithm 5 lines 7–10).
  */
final class HeavyLight(t: RootedTree) extends Serializable {
  /** Head (topmost vertex) of the chain containing each vertex. */
  val head: Array[Int] = new Array[Int](t.n)

  /** Position of each vertex in the base order (chains are contiguous). */
  val pos: Array[Int] = new Array[Int](t.n)

  // Weight of the edge (v, parent(v)) stored at pos(v); root slot unused.
  private val baseW: Array[Double] = Array.fill(t.n)(Double.NegativeInfinity)

  {
    val size = t.subtreeSize
    // Heavy child first so its chain continues contiguously.
    val order = new Array[(Int, Int)](t.n) // (vertex, chainHead) in DFS order
    var top = 0
    val stack = new Array[(Int, Int)](t.n)
    stack(0) = (0, 0); top = 1
    var p = 0
    while (top > 0) {
      top -= 1
      val (v, h) = stack(top)
      order(p) = (v, h); p += 1
      val kids = t.children(v)
      if (kids.nonEmpty) {
        var heavy = kids(0)
        kids.foreach(c => if (size(c) > size(heavy)) heavy = c)
        // push light children first so the heavy child pops first
        kids.foreach(c => if (c != heavy) { stack(top) = (c, c); top += 1 })
        stack(top) = (heavy, h); top += 1
      }
    }
    order.zipWithIndex.foreach { case ((v, h), i) =>
      head(v) = h
      pos(v) = i
      if (t.parent(v) >= 0) baseW(i) = t.parentW(v)
    }
  }

  private val rmq = Rmq.max(baseW)
  private val lca = new Lca(t)

  /** Maximum edge weight on the tree path between distinct local vertices
    * u and v; -∞ when u == v. Mirrors Algorithm 5: split at LCA(u, v),
    * then walk chain segments on each half.
    */
  def pathMaxEdge(u: Int, v: Int): Double = {
    if (u == v) return Double.NegativeInfinity
    val a = lca.of(u, v)
    math.max(maxToAncestor(u, a), maxToAncestor(v, a))
  }

  /** Max edge weight on the path from `v` up to its ancestor `anc`. */
  private def maxToAncestor(v0: Int, anc: Int): Double = {
    var v = v0
    var best = Double.NegativeInfinity
    while (head(v) != head(anc)) {
      val h = head(v)
      best = math.max(best, baseW(rmq.query(pos(h), pos(v))))
      v = t.parent(h)
    }
    if (v != anc) best = math.max(best, baseW(rmq.query(pos(anc) + 1, pos(v))))
    best
  }

  /** Path query by global ids. */
  def pathMaxEdgeIds(u: Long, v: Long): Double =
    pathMaxEdge(t.index(u), t.index(v))

  /** Number of light edges on the path from v to the root — O(log n) by
    * the decomposition property (tested directly).
    */
  def lightEdgesToRoot(v0: Int): Int = {
    var v = v0
    var c = 0
    while (head(v) != head(0)) { c += 1; v = t.parent(head(v)) }
    c
  }
}
