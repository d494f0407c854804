package repro.core

import repro.{Oracle, SparkSpec, TestGraphs}
import repro.graphs.GraphOps
import repro.mpc.{LocalContractionCC, MpcMatching, MpcMis, MpcMsf}
import repro.ref.Reference

/** Cross-model equivalence — the paper's point that "by specifying the
  * same source of randomness, both the MPC and AMPC algorithms compute
  * the same MIS" (§5.3). With shared splitmix64 priorities, AMPC, MPC and
  * the sequential reference must agree bit-for-bit.
  */
class EquivalenceSpec extends SparkSpec {

  for (seed <- 1 to 6)
    test(s"AMPC MIS == MPC MIS == sequential (seed $seed)") {
      val edges = TestGraphs.randomEdges(30, 60, seed)
      val df = TestGraphs.toDf(spark, edges)
      val ampc = AmpcMis.run(spark, df, seed.toLong).mis
      val mpc = MpcMis.run(spark, df, seed.toLong, localThreshold = 8).mis
      val ref = Reference.lfMis(TestGraphs.vertices(edges), edges, Priorities.vertexRank(_, seed.toLong))
      assert(ampc == mpc)
      assert(ampc == ref)
    }

  for (seed <- 1 to 6)
    test(s"AMPC MM == MPC MM == sequential (seed $seed)") {
      val edges = TestGraphs.randomEdges(30, 60, seed)
      val df = TestGraphs.toDf(spark, edges)
      val ampc = AmpcMatching.run(spark, df, seed.toLong).matching
      val mpc = MpcMatching.run(spark, df, seed.toLong, localThreshold = 8).matching
      val ref = Reference.lfMatching(edges, Priorities.edgeRank(_, _, seed.toLong))
      assert(ampc == mpc)
      assert(ampc == ref)
    }

  for (seed <- 1 to 6)
    test(s"AMPC MSF == Boruvka MSF == Kruskal (seed $seed)") {
      val edges = TestGraphs.withWeights(TestGraphs.randomEdges(30, 70, seed), seed)
      val df = TestGraphs.toWeightedDf(spark, edges)
      val ampc = AmpcMsf.run(spark, df, seed.toLong, searchBudget = 8).msf.toSet
      val mpc = MpcMsf.run(spark, df, seed.toLong, localThreshold = 4).msf.toSet
      val ref = Reference
        .kruskal(edges)
        .map { case (u, v, w) => (math.min(u, v), math.max(u, v), w) }
        .toSet
      assert(ampc == mpc)
      assert(ampc == ref)
    }

  for (seed <- 1 to 4)
    test(s"AMPC connectivity partition == MPC local-contraction partition (seed $seed)") {
      val edges = TestGraphs.randomEdges(40, 55, seed)
      val df = TestGraphs.toDf(spark, edges)
      val a = AmpcConnectivity.run(spark, df, seed.toLong)
      val m = LocalContractionCC.run(spark, df, seed.toLong, localThreshold = 8)
      def parts(l: org.apache.spark.sql.DataFrame) =
        l.collect().map(r => (r.getLong(0), r.getLong(1))).groupBy(_._2).values.map(_.map(_._1).toSet).toSet
      assert(parts(a.labels) == parts(m.labels))
    }

  test("AMPC 2-cycle decision == MPC local-contraction component count") {
    import repro.graphs.GraphGen
    val one = GraphGen.cycle(spark, 400)
    val two = GraphGen.twoCycles(spark, 200)
    assert(AmpcTwoCycle.run(spark, one, 1, 16).numCycles ==
      LocalContractionCC.run(spark, one, 1, localThreshold = 8).numComponents)
    assert(AmpcTwoCycle.run(spark, two, 1, 16).numCycles ==
      LocalContractionCC.run(spark, two, 1, localThreshold = 8).numComponents)
  }
}

/** DuckDB oracle checks of the relational sub-steps the algorithms are
  * built from — a wrong rootset/contraction join would surface here even
  * if the end-to-end result happened to look plausible.
  */
class RelationalStepsSpec extends SparkSpec {
  import spark.implicits._

  for (seed <- 1 to 4)
    test(s"rootset local minima match a DuckDB window query (seed $seed)") {
      val edges = TestGraphs.randomEdges(25, 50, seed)
      val df = TestGraphs.toDf(spark, edges)
      val ranks = TestGraphs
        .vertices(edges)
        .map(v => (v, Priorities.vertexRank(v, seed.toLong)))
        .toDF("id", "rnk")
      // Spark side: vertices whose rank precedes all neighbors.
      val sym = GraphOps.symmetrize(df)
      val spark_rootset = sym
        .join(ranks.withColumnRenamed("id", "src").withColumnRenamed("rnk", "rs"), "src")
        .join(ranks.withColumnRenamed("id", "dst").withColumnRenamed("rnk", "rd"), "dst")
        .groupBy($"src" as "id")
        .agg(
          org.apache.spark.sql.functions.min(
            org.apache.spark.sql.functions.when($"rs" < $"rd", 1).otherwise(0)) as "isMin")
        .where($"isMin" === 1)
        .select($"id".cast("long") as "id")
      Oracle.assertEquivalent(
        spark_rootset,
        """WITH sym AS (
          |  SELECT src, dst FROM edges UNION ALL SELECT dst, src FROM edges
          |)
          |SELECT CAST(s.src AS BIGINT) AS id
          |FROM sym s
          |JOIN ranks ru ON ru.id = s.src
          |JOIN ranks rv ON rv.id = s.dst
          |GROUP BY s.src
          |HAVING MIN(CASE WHEN CAST(ru.rnk AS HUGEINT) < CAST(rv.rnk AS HUGEINT) THEN 1 ELSE 0 END) = 1""".stripMargin,
        "edges" -> df,
        "ranks" -> ranks,
      )
    }

  for (seed <- 1 to 4)
    test(s"contraction mapping application matches a DuckDB join (seed $seed)") {
      val edges = TestGraphs.randomEdges(20, 40, seed)
      val df = TestGraphs.toDf(spark, edges)
      // an arbitrary deterministic mapping: v -> v / 3
      val mapping = TestGraphs.vertices(edges).map(v => (v, v / 3)).toDF("id", "root")
      val contracted = df
        .join(mapping.withColumnRenamed("id", "src").withColumnRenamed("root", "ru"), "src")
        .join(mapping.withColumnRenamed("id", "dst").withColumnRenamed("root", "rv"), "dst")
        .where($"ru" =!= $"rv")
        .select(
          org.apache.spark.sql.functions.least($"ru", $"rv") as "cu",
          org.apache.spark.sql.functions.greatest($"ru", $"rv") as "cv")
        .distinct()
      Oracle.assertEquivalent(
        contracted,
        """SELECT DISTINCT
          |  LEAST(CAST(mu.root AS BIGINT), CAST(mv.root AS BIGINT)) AS cu,
          |  GREATEST(CAST(mu.root AS BIGINT), CAST(mv.root AS BIGINT)) AS cv
          |FROM edges e
          |JOIN mapping mu ON mu.id = e.src
          |JOIN mapping mv ON mv.id = e.dst
          |WHERE mu.root <> mv.root""".stripMargin,
        "edges" -> df,
        "mapping" -> mapping,
      )
    }

  test("minimum incident edge per vertex matches DuckDB (Boruvka step)") {
    val edges = TestGraphs.withWeights(TestGraphs.randomEdges(20, 40, 5), 5)
    val df = TestGraphs.toWeightedDf(spark, edges)
    val sym = GraphOps.symmetrize(df)
    val minEdge = sym
      .groupBy($"src" as "id")
      .agg(org.apache.spark.sql.functions.min($"weight") as "minw")
    Oracle.assertEquivalent(
      minEdge,
      """SELECT CAST(id AS BIGINT) AS id, MIN(CAST(weight AS DOUBLE)) AS minw FROM (
        |  SELECT src AS id, weight FROM edges
        |  UNION ALL SELECT dst AS id, weight FROM edges
        |) GROUP BY id""".stripMargin,
      "edges" -> df,
    )
  }
}
