package repro

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.types._

/** Synthetic graphs for the recursive-query experiments (§5–6). The paper
  * evaluates no concrete dataset; these generators give controllable size
  * and fixpoint depth. Deterministic in (parameters, seed).
  */
object SynthGraph {

  /** Uniform random directed graph: `nEdges` distinct edges over `nNodes`
    * nodes, columns (h, t), self-loops removed.
    */
  def uniformEdges(spark: SparkSession, nNodes: Long, nEdges: Long, seed: Long = 7): DataFrame =
    spark.range(nEdges * 2) // oversample: distinct + self-loop removal shrink the set
      .select(
        (rand(seed) * nNodes).cast(LongType) as "h",
        (rand(seed + 1) * nNodes).cast(LongType) as "t")
      .where(col("h") =!= col("t"))
      .distinct()
      .limit(nEdges.toInt)

  /** Layered DAG: `layers` layers of `width` nodes; each node has `fanout`
    * edges to random nodes of the next layer. Fixpoint depth = `layers`.
    * Node id of (layer l, index i) is l*width + i.
    */
  def layeredEdges(spark: SparkSession, layers: Int, width: Int, fanout: Int,
                   seed: Long = 11): DataFrame = {
    require(layers >= 2)
    val perLayer = width.toLong * fanout
    spark.range((layers - 1).toLong * perLayer)
      .select(
        (col("id") / perLayer).cast(LongType) as "layer",
        ((col("id") % perLayer) / fanout).cast(LongType) as "idx",
        col("id"))
      .select(
        (col("layer") * width + col("idx")) as "h",
        ((col("layer") + 1) * width
          + (rand(seed) * width).cast(LongType)) as "t")
      .distinct()
  }

  /** A simple path 0 → 1 → … → n−1: worst-case fixpoint depth. */
  def chain(spark: SparkSession, n: Int): DataFrame =
    spark.range(n - 1).select(col("id") as "h", (col("id") + 1) as "t")
}
