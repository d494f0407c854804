package repro.core

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** Graph ternarization — Algorithm 2 line 2.
  *
  * Every vertex v with degree k > 3 is replaced by a cycle of k gadget
  * vertices; the i-th incident edge of v (in neighbor-id order) attaches
  * to the i-th gadget vertex. Dummy cycle edges get weight ⊥ = -∞, lower
  * than every real weight, so every MSF of the ternarized graph contains
  * exactly k-1 of each gadget cycle's edges and its real edges map back
  * to an MSF of the original graph.
  *
  * Gadget ids are `v * slotBase + slot` where `slotBase` > max degree, so
  * `origOf` is a pure function — no lookup table needed on the way back.
  */
object Ternarize {

  final case class Result(edges: DataFrame, slotBase: Long)

  val Bottom: Double = Double.NegativeInfinity

  def origOf(newId: Long, slotBase: Long): Long = newId / slotBase

  /** Map an MSF of the ternarized graph back: drop dummy edges, restore
    * endpoints (Algorithm 2 line 5).
    */
  def restoreMsf(
      msf: Seq[(Long, Long, Double)],
      slotBase: Long,
  ): Seq[(Long, Long, Double)] =
    msf
      .filter { case (_, _, w) => !w.isNegInfinity }
      .map { case (u, v, w) =>
        val a = origOf(u, slotBase); val b = origOf(v, slotBase)
        (math.min(a, b), math.max(a, b), w)
      }

  /** Ternarize a canonical weighted edge list. Weights must be finite. */
  def ternarize(spark: SparkSession, weightedEdges: DataFrame): Result = {
    val sym = repro.graphs.GraphOps.symmetrize(weightedEdges.select("src", "dst", "weight"))
    val win = Window.partitionBy("src").orderBy("dst")
    val withSlot = sym
      .withColumn("slot", row_number().over(win) - 1)
      .withColumn("deg", count(lit(1)).over(Window.partitionBy("src")))
    val maxDeg = withSlot.agg(max("deg")).collect()(0).getLong(0)
    val slotBase = math.max(4L, maxDeg + 1)

    val gadgetId = (v: org.apache.spark.sql.Column, slot: org.apache.spark.sql.Column, deg: org.apache.spark.sql.Column) =>
      when(deg <= 3, v * slotBase).otherwise(v * slotBase + slot)

    // Real edges: pair the two directed halves to learn both slots.
    val d1 = withSlot.select(
      col("src") as "u", col("dst") as "v", col("weight") as "w",
      col("slot") as "slotU", col("deg") as "degU",
    )
    val d2 = withSlot.select(
      col("src") as "v2", col("dst") as "u2",
      col("slot") as "slotV", col("deg") as "degV",
    )
    val paired = d1
      .join(d2, d1("u") === d2("u2") && d1("v") === d2("v2"))
      .where(col("u") < col("v")) // emit each undirected edge once
      .select(
        gadgetId(col("u"), col("slotU"), col("degU")) as "src",
        gadgetId(col("v"), col("slotV"), col("degV")) as "dst",
        col("w") as "weight",
      )

    // Dummy cycle edges for high-degree vertices.
    val dummies = withSlot
      .select("src", "deg")
      .distinct()
      .where(col("deg") > 3)
      .select(col("src") as "v", explode(sequence(lit(0), col("deg") - 1)) as "i", col("deg"))
      .select(
        (col("v") * slotBase + col("i")) as "src",
        (col("v") * slotBase + (col("i") + 1) % col("deg")) as "dst",
        lit(Bottom) as "weight",
      )

    Result(paired.union(dummies), slotBase)
  }
}
