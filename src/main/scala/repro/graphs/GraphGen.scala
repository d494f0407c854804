package repro.graphs

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.Priorities.splitmix64

/** Synthetic graph generators — laptop-scale analogs of the paper's
  * datasets (Table 2) plus the 2×k cycle family of §5.6.
  *
  * Every generator is deterministic in its parameters and seed regardless
  * of partitioning: per-row randomness is derived from splitmix64 of the
  * row id, never from partition-local RNG state.
  *
  * Graphs are undirected and returned in canonical edge-list form:
  * columns `src: Long`, `dst: Long` with `src < dst`, no loops, no
  * duplicates (the paper symmetrizes its directed inputs the same way).
  */
object GraphGen {

  /** R-MAT power-law graph: n = 2^scale vertices, ~`edgeFactor`·n sampled
    * directed edges, canonicalized. Skew is controlled by (a, b, c); the
    * defaults mimic social-network degree distributions, higher `a`
    * mimics web-graph skew (the ClueWeb join-skew phenomenon of §5.3).
    */
  def rmat(
      spark: SparkSession,
      scale: Int,
      edgeFactor: Int,
      seed: Long,
      a: Double = 0.57,
      b: Double = 0.19,
      c: Double = 0.19,
  ): DataFrame = {
    import spark.implicits._
    require(scale > 0 && scale < 31, s"bad scale $scale")
    val n = 1L << scale
    val samples = n * edgeFactor
    val (aa, bb, cc) = (a, b, c)
    val raw = spark
      .range(samples)
      .as[Long]
      .mapPartitions { rows =>
        rows.map { i =>
          var u = 0L; var v = 0L
          var level = 0
          var h = splitmix64(seed ^ splitmix64(i))
          while (level < scale) {
            // One uniform draw per level, refreshed from the row stream.
            h = splitmix64(h)
            val r = (h >>> 11).toDouble / (1L << 53).toDouble
            val (du, dv) =
              if (r < aa) (0, 0)
              else if (r < aa + bb) (0, 1)
              else if (r < aa + bb + cc) (1, 0)
              else (1, 1)
            u = (u << 1) | du
            v = (v << 1) | dv
            level += 1
          }
          (u, v)
        }
      }
      .toDF("src", "dst")
    GraphOps.canonicalize(raw)
  }

  /** Uniform random graph: `samples` endpoint pairs over [0, n), canonicalized. */
  def uniform(spark: SparkSession, n: Long, samples: Long, seed: Long): DataFrame = {
    import spark.implicits._
    val raw = spark
      .range(samples)
      .as[Long]
      .mapPartitions { rows =>
        rows.map { i =>
          val u = java.lang.Long.remainderUnsigned(splitmix64(seed ^ splitmix64(2 * i)), n)
          val v = java.lang.Long.remainderUnsigned(splitmix64(seed ^ splitmix64(2 * i + 1)), n)
          (u, v)
        }
      }
      .toDF("src", "dst")
    GraphOps.canonicalize(raw)
  }

  /** Single cycle on `k` vertices with ids offset..offset+k-1. */
  def cycle(spark: SparkSession, k: Long, offset: Long = 0): DataFrame = {
    import spark.implicits._
    require(k >= 3, s"cycle needs k >= 3, got $k")
    val raw = spark
      .range(k)
      .select(
        (col("id") + offset) as "src",
        (((col("id") + 1) % k) + offset) as "dst",
      )
    GraphOps.canonicalize(raw)
  }

  /** The paper's 2×k family: two disjoint cycles of k vertices each. */
  def twoCycles(spark: SparkSession, k: Long): DataFrame =
    cycle(spark, k, 0).union(cycle(spark, k, k))

  /** Simple path v_offset — … — v_{offset+k-1}. */
  def path(spark: SparkSession, k: Long, offset: Long = 0): DataFrame = {
    import spark.implicits._
    require(k >= 2)
    spark
      .range(k - 1)
      .select((col("id") + offset) as "src", (col("id") + offset + 1) as "dst")
  }

  /** Star: center `offset`, leaves offset+1..offset+k. */
  def star(spark: SparkSession, leaves: Long, offset: Long = 0): DataFrame = {
    import spark.implicits._
    spark
      .range(1, leaves + 1)
      .select(lit(offset) as "src", (col("id") + offset) as "dst")
  }

  /** Complete binary tree on k vertices (ids offset..offset+k-1, heap layout). */
  def binaryTree(spark: SparkSession, k: Long, offset: Long = 0): DataFrame = {
    import spark.implicits._
    spark
      .range(1, k)
      .select((((col("id") - 1) / 2).cast("long") + offset) as "src", (col("id") + offset) as "dst")
  }

  /** Clutter: `count` disjoint small paths of `size` vertices each, ids
    * starting at `offset`. Mimics the Hyperlink2012 analog's 144M small
    * components at laptop scale.
    */
  def clutter(spark: SparkSession, count: Long, size: Long, offset: Long): DataFrame = {
    import spark.implicits._
    require(size >= 2)
    spark
      .range(count * (size - 1))
      .select(
        (col("id") / (size - 1)).cast("long") as "comp",
        (col("id") % (size - 1)) as "pos",
      )
      .select(
        ($"comp" * size + $"pos" + offset) as "src",
        ($"comp" * size + $"pos" + 1 + offset) as "dst",
      )
  }
}
