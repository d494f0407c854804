package repro.core

import org.scalatest.funsuite.AnyFunSuite

class PrioritiesSpec extends AnyFunSuite {
  private val rng = new scala.util.Random(7)

  test("splitmix64 is deterministic") {
    assert(Priorities.splitmix64(42L) == Priorities.splitmix64(42L))
  }

  test("splitmix64 of distinct inputs does not collide on a 1e5 range") {
    val vals = (0L until 100000L).map(Priorities.splitmix64)
    assert(vals.distinct.size == vals.size)
  }

  test("vertexRank depends on seed") {
    assert(Priorities.vertexRank(5, 1) != Priorities.vertexRank(5, 2))
  }

  for (i <- 1 to 10)
    test(s"edgeRank is symmetric in endpoints (case $i)") {
      val u = rng.nextLong(); val v = rng.nextLong(); val s = rng.nextLong()
      assert(Priorities.edgeRank(u, v, s) == Priorities.edgeRank(v, u, s))
    }

  for (i <- 1 to 10)
    test(s"toUnit is in [0, 1) (case $i)") {
      val u = Priorities.toUnit(rng.nextLong())
      assert(u >= 0.0 && u < 1.0)
    }

  test("toUnit is roughly uniform") {
    val n = 100000
    val below = (0 until n).count(i => Priorities.toUnit(Priorities.splitmix64(i.toLong)) < 0.25)
    assert(math.abs(below.toDouble / n - 0.25) < 0.02)
  }

  for (i <- 1 to 10)
    test(s"precedes is a strict total order on (rank, id) (case $i)") {
      val a = rng.nextLong(1000); val b = rng.nextLong(1000); val s = rng.nextLong()
      val ra = Priorities.vertexRank(a, s); val rb = Priorities.vertexRank(b, s)
      if (a == b) assert(!Priorities.precedes(ra, a, rb, b))
      else assert(Priorities.precedes(ra, a, rb, b) != Priorities.precedes(rb, b, ra, a))
    }

  for (seed <- 1 to 5)
    test(s"rank-induced permutation is seed-stable (seed $seed)") {
      val vs = (0L until 200L)
      val p1 = vs.sortBy(v => (Priorities.vertexRank(v, seed.toLong), v))
      val p2 = vs.sortBy(v => (Priorities.vertexRank(v, seed.toLong), v))
      assert(p1 == p2)
      val other = vs.sortBy(v => (Priorities.vertexRank(v, seed + 100L), v))
      assert(p1 != other) // astronomically unlikely to coincide
    }
}
