package repro.core

import repro.SparkSpec
import repro.graphs.GraphGen

class AmpcTwoCycleSpec extends SparkSpec {

  for (k <- Seq(100L, 500L, 1000L))
    test(s"two cycles of $k are reported as 2") {
      val res = AmpcTwoCycle.run(spark, GraphGen.twoCycles(spark, k), seed = 1, sampleInv = 16)
      assert(res.numCycles == 2 && res.exact)
      assert(res.covered == 2 * k)
    }

  for (k <- Seq(200L, 1000L, 2000L))
    test(s"one cycle of $k is reported as 1") {
      val res = AmpcTwoCycle.run(spark, GraphGen.cycle(spark, k), seed = 2, sampleInv = 16)
      assert(res.numCycles == 1 && res.exact)
      assert(res.covered == k)
    }

  for (seed <- 1 to 5)
    test(s"decision is seed-independent (seed $seed)") {
      val one = AmpcTwoCycle.run(spark, GraphGen.cycle(spark, 600), seed.toLong, sampleInv = 16)
      val two = AmpcTwoCycle.run(spark, GraphGen.twoCycles(spark, 300), seed.toLong, sampleInv = 16)
      assert(one.numCycles == 1)
      assert(two.numCycles == 2)
    }

  test("three cycles are counted too (the contraction generalizes)") {
    val g = GraphGen.cycle(spark, 200, 0)
      .union(GraphGen.cycle(spark, 200, 200))
      .union(GraphGen.cycle(spark, 200, 400))
    val res = AmpcTwoCycle.run(spark, g, seed = 3, sampleInv = 16)
    assert(res.numCycles == 3 && res.exact)
  }

  test("uses a single shuffle (the graph/DHT construction)") {
    val res = AmpcTwoCycle.run(spark, GraphGen.twoCycles(spark, 200), seed = 4, sampleInv = 16)
    assert(res.metrics.shuffles == 1)
  }

  test("walk chains are recorded (the latency-bound critical path)") {
    val res = AmpcTwoCycle.run(spark, GraphGen.cycle(spark, 500), seed = 5, sampleInv = 32)
    assert(res.metrics.maxChainDepth > 1)
  }

  test("sampling rate controls the sampled count roughly") {
    val res = AmpcTwoCycle.run(spark, GraphGen.cycle(spark, 2000), seed = 6, sampleInv = 16)
    assert(res.sampled > 2000 / 16 / 3 && res.sampled < 2000 / 16 * 3)
  }

  test("no-sample fallback still answers on a tiny cycle") {
    // sampleInv larger than the cycle: whp zero hash-samples, forcing the
    // deterministic fallback vertex.
    val res = AmpcTwoCycle.run(spark, GraphGen.cycle(spark, 5), seed = 101, sampleInv = 1 << 20)
    assert(res.numCycles == 1 && res.exact)
  }

  test("coverage detects an unsampled cycle as extra component(s)") {
    // Force sampling only in the first cycle's id range by choosing a seed
    // where the second tiny cycle has no samples; with sampleInv huge, only
    // the forced minimum vertex (id 0, first cycle) is sampled.
    val g = GraphGen.cycle(spark, 50, 0).union(GraphGen.cycle(spark, 50, 50))
    val res = AmpcTwoCycle.run(spark, g, seed = 7, sampleInv = 1 << 20)
    assert(!res.exact)
    assert(res.numCycles >= 2) // 1 seen + >=1 uncovered
  }
}
