package repro.core

import org.apache.spark.sql.functions._
import repro.{SparkSpec, TestGraphs}
import repro.graphs.GraphOps
import repro.ref.Reference

class TernarizeSpec extends SparkSpec {

  for (seed <- 1 to 6)
    test(s"ternarized graph has max degree 3 (seed $seed)") {
      val edges = TestGraphs.withWeights(TestGraphs.randomEdges(20, 50, seed), seed)
      val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, edges))
      val maxDeg = GraphOps.degrees(t.edges).agg(max("degree")).collect()(0).getLong(0)
      assert(maxDeg <= 3, s"max degree $maxDeg")
    }

  for (seed <- 1 to 6)
    test(s"MSF of ternarized graph restores to the original MSF (seed $seed)") {
      val edges = TestGraphs.withWeights(TestGraphs.randomEdges(18, 40, seed), seed)
      val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, edges))
      val tEdges = GraphOps.collectWeighted(t.edges)
      val tMsf = Reference.kruskal(tEdges)
      val restored = Ternarize.restoreMsf(tMsf, t.slotBase)
      val expected = Reference
        .kruskal(edges)
        .map { case (u, v, w) => (math.min(u, v), math.max(u, v), w) }
      assert(restored.toSet == expected.toSet)
    }

  test("low-degree vertices keep a single gadget vertex") {
    val path = TestGraphs.withWeights((0 until 5).map(i => (i.toLong, (i + 1).toLong)), 1)
    val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, path))
    // no vertex has degree > 3, so the edge count must not change
    assert(t.edges.count() == path.size)
    val es = GraphOps.collectWeighted(t.edges)
    assert(es.forall { case (u, v, _) => u % t.slotBase == 0 && v % t.slotBase == 0 })
  }

  test("a degree-k vertex becomes a k-cycle of bottom-weight edges") {
    val star = TestGraphs.withWeights((1L to 6L).map(i => (0L, i)), 2)
    val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, star))
    val es = GraphOps.collectWeighted(t.edges)
    val dummies = es.filter(_._3.isNegInfinity)
    assert(dummies.size == 6) // the center's cycle
    assert(es.size == 6 + 6)
    // gadget count: center contributes 6 vertices, leaves 1 each
    val vertices = es.flatMap(e => Seq(e._1, e._2)).distinct
    assert(vertices.size == 6 + 6)
  }

  test("ternarization preserves connectivity") {
    val edges = TestGraphs.withWeights(TestGraphs.connectedEdges(15, 20, 3), 3)
    val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, edges))
    val es = GraphOps.collectWeighted(t.edges).map(e => (e._1, e._2))
    val labels = Reference.connectedComponents(TestGraphs.vertices(es), es)
    assert(labels.values.toSet.size == 1)
  }

  test("origOf inverts the gadget encoding") {
    assert(Ternarize.origOf(7L * 10 + 3, 10) == 7L)
    assert(Ternarize.origOf(7L * 10, 10) == 7L)
  }

  test("Algorithm 2 composition: ternarize -> AMPC MSF -> restore") {
    val edges = TestGraphs.withWeights(TestGraphs.randomEdges(16, 36, 9), 9)
    val t = Ternarize.ternarize(spark, TestGraphs.toWeightedDf(spark, edges))
    val res = AmpcMsf.run(spark, t.edges, seed = 9, searchBudget = 8)
    val restored = Ternarize.restoreMsf(res.msf, t.slotBase)
    val expected = Reference
      .kruskal(edges)
      .map { case (u, v, w) => (math.min(u, v), math.max(u, v), w) }
    assert(restored.toSet == expected.toSet)
  }
}
