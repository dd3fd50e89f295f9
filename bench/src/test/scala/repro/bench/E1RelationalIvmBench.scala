package repro.bench

import repro.SparkSpec
import repro.harness.experiments.E1RelationalIvm

/** E1 — §4.4 query over TPC-H-lite at SF 0.1: incremental vs naïve lifted
  * per-tick latency across change sizes. Shape claim (§4.5): the incremental
  * circuit wins when C ≪ R and its advantage shrinks as C → R.
  */
class E1RelationalIvmBench extends SparkSpec {
  test("E1: incremental view maintenance, Δ sweep at SF 0.1") {
    val rows = E1RelationalIvm.run(spark, sf = 0.1,
      deltaFracs = Seq(0.0001, 0.001, 0.01, 0.1))
    E1RelationalIvm.emit(rows)
    // Shape: at the smallest delta the incremental circuit must beat the
    // naïve recompute; speedup must not grow as the delta grows.
    assert(rows.head.incMs < rows.head.naiveMs,
      s"small-delta incremental (${rows.head.incMs} ms) not faster than naive (${rows.head.naiveMs} ms)")
    val speedups = rows.map(r => r.naiveMs / r.incMs)
    assert(speedups.head >= speedups.last * 0.8,
      s"speedup should shrink as C → R: $speedups")
  }
}
