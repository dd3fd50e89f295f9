package repro.bench

import repro.SparkSpec
import repro.harness.experiments.T1OperatorMatrix

/** Table 1 at benchmark scale — prints the operator matrix and asserts every
  * operator's incremental circuit agrees with the naïve lifted one.
  */
class T1OperatorMatrixBench extends SparkSpec {
  test("T1: Table 1 operator matrix, incremental ≡ naïve at 50k rows") {
    val rows = T1OperatorMatrix.run(spark, baseRows = 50000, ticks = 3)
    T1OperatorMatrix.emit(rows)
    rows.foreach(r => assert(r.ok, s"${r.op}: incremental ≠ naïve"))
  }
}
