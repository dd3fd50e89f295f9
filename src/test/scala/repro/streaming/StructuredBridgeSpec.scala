package repro.streaming

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream

import repro.agg.{AggFunc, GroupAggregate, IncrementalGroupAggregate}
import repro.core.IncrementalDistinct
import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

/** DBSP-as-Structured-Streaming: the incremental circuit runs inside
  * `foreachBatch` over a memory source; micro-batches are DBSP ticks. This
  * is the reproduction hint's "Structured Streaming operators maintaining
  * incremental aggregates/joins over DataFrame streams".
  */
class StructuredBridgeSpec extends SparkSpec with ZSetFixtures {

  test("incremental grouped COUNT as a streaming query over a memory source") {
    val sparkS = spark
    import sparkS.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = sparkS.sqlContext

    val source = MemoryStream[(Long, Long, Long)] // (k, v, weight)
    val agg = new IncrementalGroupAggregate(Seq("k"), AggFunc.Count())
    val driver = new ForeachBatchDriver(z => agg.step(z))

    val query = source.toDF().toDF("k", "v", ZSet.W)
      .writeStream
      .outputMode("update")
      .foreachBatch(driver.handle _)
      .start()
    try {
      source.addData((1L, 10L, 1L), (1L, 20L, 1L), (2L, 5L, 1L))
      query.processAllAvailable()
      source.addData((1L, 10L, -1L), (3L, 7L, 1L))
      query.processAllAvailable()
      source.addData((2L, 5L, -1L))
      query.processAllAvailable()
    } finally query.stop()

    // Integrate the per-batch view deltas and compare with a batch recompute
    // over the integrated input.
    val outs = driver.outputs
    assert(outs.nonEmpty)
    val view = outs.reduce(_ plus _)
    val input = zs2("k", "v",
      (1L, 10L) -> 1L, (1L, 20L) -> 1L, (2L, 5L) -> 1L,
      (1L, 10L) -> -1L, (3L, 7L) -> 1L, (2L, 5L) -> -1L)
    val expected = GroupAggregate.batch(input, Seq("k"), AggFunc.Count())
    assert(view.zequals(expected))
  }

  test("incremental DISTINCT view as a streaming query") {
    val sparkS = spark
    import sparkS.implicits._
    implicit val sqlCtx: org.apache.spark.sql.SQLContext = sparkS.sqlContext

    val source = MemoryStream[(Long, Long)] // (k, weight)
    val dist = new IncrementalDistinct
    val driver = new ForeachBatchDriver(z => dist.step(z))

    val query = source.toDF().toDF("k", ZSet.W)
      .writeStream
      .outputMode("update")
      .foreachBatch(driver.handle _)
      .start()
    try {
      source.addData((1L, 1L), (1L, 1L), (2L, 1L)) // duplicate insert of key 1
      query.processAllAvailable()
      source.addData((1L, -1L))                     // one copy removed: still present
      query.processAllAvailable()
      source.addData((1L, -1L))                     // now gone
      query.processAllAvailable()
    } finally query.stop()

    val view = driver.outputs.reduce(_ plus _)
    assert(entriesOf(view) == Set((Seq("2"), 1L)))
  }
}
