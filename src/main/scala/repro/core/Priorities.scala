package repro.core

/** Deterministic pseudo-random priorities shared by every implementation.
  *
  * The paper's AMPC and MPC algorithms "compute the same MIS" by
  * "specifying the same source of randomness" (§5.3). We realize that with
  * splitmix64: the same (id, seed) maps to the same 64-bit rank on the
  * Spark side, the single-machine reference side, and the DuckDB side —
  * which makes the lexicographically-first MIS/MM *unique* and therefore
  * an exact cross-implementation oracle.
  *
  * Ranks are compared as (rank, id) so collisions cannot create ties.
  */
object Priorities {

  /** splitmix64 finalizer — a high-quality 64-bit mixer. */
  def splitmix64(x0: Long): Long = {
    var x = x0 + 0x9e3779b97f4a7c15L
    x = (x ^ (x >>> 30)) * 0xbf58476d1ce4e5b9L
    x = (x ^ (x >>> 27)) * 0x94d049bb133111ebL
    x ^ (x >>> 31)
  }

  /** Rank of a vertex under the random permutation derived from `seed`. */
  def vertexRank(v: Long, seed: Long): Long =
    splitmix64(v ^ splitmix64(seed))

  /** Rank of an undirected edge (endpoint order does not matter). */
  def edgeRank(u: Long, v: Long, seed: Long): Long = {
    val a = math.min(u, v); val b = math.max(u, v)
    splitmix64(a ^ splitmix64(b ^ splitmix64(seed)))
  }

  /** Uniform double in [0, 1) derived from a rank. */
  def toUnit(rank: Long): Double =
    (rank >>> 11).toDouble / (1L << 53).toDouble

  /** True iff vertex u precedes v in the permutation ("higher priority"). */
  def precedes(uRank: Long, u: Long, vRank: Long, v: Long): Boolean =
    uRank < vRank || (uRank == vRank && u < v)
}
