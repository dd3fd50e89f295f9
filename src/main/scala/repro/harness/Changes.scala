package repro.harness

import org.apache.spark.sql.functions._

import repro.zset.ZSet

/** Deterministic change-stream generator: slices a positive Z-set into an
  * initial bulk load plus per-tick inserts and (optionally) later deletions
  * with negative weights — the transaction stream T of the paper's
  * fundamental equation.
  */
object Changes {

  /** @param base        the relation's final "universe" (treated as a set)
    * @param ticks       number of transactions (≥ 1)
    * @param initialFrac fraction of rows arriving in tick 0
    * @param deleteFrac  fraction of inserted rows deleted one tick later
    *                    (rows inserted in the final tick are never deleted)
    */
  def stream(base: ZSet, ticks: Int, initialFrac: Double = 0.5,
             deleteFrac: Double = 0.0, seed: Long = 17): IndexedSeq[ZSet] = {
    require(ticks >= 1)
    val cols = base.dataCols
    val u1 = pmod(xxhash64((cols.map(col) :+ lit(seed)): _*), lit(1000000L)) / 1e6
    val u2 = pmod(xxhash64((cols.map(col) :+ lit(seed + 1)): _*), lit(1000000L)) / 1e6
    val tickCol =
      if (ticks == 1) lit(0)
      else when(u1 < initialFrac, 0)
        .otherwise(least(lit(ticks - 1),
          (lit(1) + ((u1 - initialFrac) / (1 - initialFrac)) * (ticks - 1)).cast("int")))
    val tagged = base.distinctZ.df
      .withColumn("__tick", tickCol)
      .withColumn("__del",
        when(u2 < deleteFrac && tickCol < ticks - 1, tickCol + 1).otherwise(lit(-1)))
      .coalesce(8)
      .localCheckpoint()

    (0 until ticks).map { t =>
      val ins = tagged.where(col("__tick") === t)
        .drop("__tick", "__del")
      val del = tagged.where(col("__del") === t)
        .drop("__tick", "__del")
        .withColumn(ZSet.W, -col(ZSet.W))
      ZSet.raw(ins.unionByName(del))
    }
  }
}
