package repro.bench

import repro.SparkSpec
import repro.harness.experiments.{E4SemiNaive, E5IncrementalRecursion}

/** E4 — §5.1: naïve vs semi-naïve fixpoint work per iteration. */
class E4SemiNaiveBench extends SparkSpec {
  test("E4: naïve vs semi-naïve transitive closure on a layered DAG") {
    val r = E4SemiNaive.run(spark, layers = 8, width = 40, fanout = 3)
    E4SemiNaive.emit(r)
    // Shape claims: identical fixpoints (checked inside run), semi-naïve
    // total tuples strictly below naïve, per-iteration deltas ≤ full sizes.
    assert(r.semiWork.sum < r.naiveWork.sum)
    r.semiWork.zip(r.naiveWork).foreach { case (d, f) => assert(d <= f) }
  }
}

/** E5 — §6.2: incrementally-maintained recursion vs from-scratch recompute. */
class E5IncrementalRecursionBench extends SparkSpec {
  test("E5: incremental TC maintenance under single-edge transactions") {
    val width = 40
    val updates = Seq[(Long, Long, Long)](
      (0L, 6L * width, 1L),            // long-range insert (new shortcuts)
      (2L * width + 1, 2L * width + 2, 1L), // local insert within a layer
      (0L, 6L * width, -1L),           // delete the shortcut again
      (width.toLong, 2L * width, 1L))  // cross-layer insert
    val rows = E5IncrementalRecursion.run(spark, layers = 7, width = width, fanout = 3, updates)
    E5IncrementalRecursion.emit(rows)
    // Shape claim (§6.2): per-update derived tuples for the incremental
    // circuit are a small fraction of a from-scratch semi-naïve recompute.
    rows.drop(1).foreach { r =>
      assert(r.incTuples < r.scratchTuples / 2,
        s"${r.update}: inc tuples ${r.incTuples} not ≪ scratch ${r.scratchTuples}")
    }
  }
}
