package repro.trees

/** Sparse-table range queries (Appendix B "Range-minimum queries").
  *
  * Precomputes b(x, y) = best index in [x, x+2^y) for an arbitrary
  * idempotent "better" relation, answering queries in O(1) after
  * O(k log k) preprocessing — exactly the structure from the paper, which
  * notes it is MPC-computable in O(1) rounds [Andoni et al.].
  */
final class SparseTable(n: Int, better: (Int, Int) => Int) extends Serializable {
  require(n > 0, "empty range")
  private val logs: Array[Int] = {
    val l = new Array[Int](n + 1)
    var i = 2
    while (i <= n) { l(i) = l(i / 2) + 1; i += 1 }
    l
  }
  private val table: Array[Array[Int]] = {
    val levels = logs(n) + 1
    val t = new Array[Array[Int]](levels)
    t(0) = Array.tabulate(n)(identity)
    var y = 1
    while (y < levels) {
      val span = 1 << y
      val prev = t(y - 1)
      t(y) = Array.tabulate(n - span + 1)(x => better(prev(x), prev(x + span / 2)))
      y += 1
    }
    t
  }

  /** Best index in the inclusive range [i, j]. */
  def query(i: Int, j: Int): Int = {
    require(i <= j && i >= 0 && j < n, s"bad range [$i,$j] of $n")
    val t = logs(j - i + 1)
    better(table(t)(i), table(t)(j - (1 << t) + 1))
  }
}

object Rmq {

  /** Argmin table over doubles (ties to the lower index). */
  def min(values: Array[Double]): SparseTable =
    new SparseTable(values.length, (a, b) => if (values(a) <= values(b)) a else b)

  /** Argmax table over doubles (ties to the lower index). */
  def max(values: Array[Double]): SparseTable =
    new SparseTable(values.length, (a, b) => if (values(a) >= values(b)) a else b)

  /** Argmin table over ints — used on Euler-tour levels for LCA. */
  def minInt(values: Array[Int]): SparseTable =
    new SparseTable(values.length, (a, b) => if (values(a) <= values(b)) a else b)
}
