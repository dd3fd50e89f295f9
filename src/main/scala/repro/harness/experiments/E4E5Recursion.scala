package repro.harness.experiments

import org.apache.spark.sql.SparkSession

import repro.SynthGraph
import repro.harness.Report
import repro.nested.IncrementalTransitiveClosure
import repro.recursive.TransitiveClosure
import repro.zset.ZSet

/** Experiment E4 — §5.1: naïve vs semi-naïve fixpoint evaluation of the
  * transitive closure. The table shows, per iteration, the tuples the loop
  * body produces: the full relation for naïve, only the frontier delta for
  * semi-naïve — Algorithm 1 vs Algorithm 2 of [11], derived in DBSP by the
  * cycle rule.
  */
object E4SemiNaive {

  final case class Result(
      closureSize: Long,
      naiveIters: Int, semiIters: Int,
      naiveWork: Seq[Long], semiWork: Seq[Long],
      naiveMs: Double, semiMs: Double)

  def run(spark: SparkSession, layers: Int, width: Int, fanout: Int): Result = {
    val e = ZSet.fromSet(SynthGraph.layeredEdges(spark, layers, width, fanout)).compact()
    val ((rn, sn), naiveMs) = Report.timed(TransitiveClosure.naive(e))
    val ((rs, ss), semiMs) = Report.timed(TransitiveClosure.semiNaive(e))
    require(rn.zequals(rs), "naive and semi-naive closures differ")
    Result(rs.entryCount, sn.iterations, ss.iterations,
      sn.workPerIteration, ss.workPerIteration, naiveMs, semiMs)
  }

  val headers: Seq[String] = Seq("iteration", "naïve tuples", "semi-naïve Δ tuples")

  def render(r: Result): Seq[Seq[String]] = {
    val n = math.max(r.naiveWork.size, r.semiWork.size)
    (0 until n).map { i =>
      Seq(i.toString,
        r.naiveWork.lift(i).map(_.toString).getOrElse("-"),
        r.semiWork.lift(i).map(_.toString).getOrElse("-"))
    } :+ Seq("TOTAL", r.naiveWork.sum.toString, r.semiWork.sum.toString) :+
      Seq("wall ms", Report.f1(r.naiveMs), Report.f1(r.semiMs))
  }

  def emit(r: Result): Unit =
    Report.emit(s"E4 — naïve vs semi-naïve TC (|closure| = ${r.closureSize})",
      headers, render(r))
}

/** Experiment E5 — §6.1/§6.2: incremental maintenance of a recursive query.
  * After a bulk load, single-edge transactions (inserts and deletes) are
  * applied; we compare the incrementally-maintained circuit of Figure 2
  * against a from-scratch semi-naïve recomputation, on both wall time and
  * tuples derived (the paper's claim is about the latter: work proportional
  * to the changes, at the price of per-iteration state).
  */
object E5IncrementalRecursion {

  final case class Row(update: String, incMs: Double, incTuples: Long,
                       scratchMs: Double, scratchTuples: Long, viewDelta: Long)

  def run(spark: SparkSession, layers: Int, width: Int, fanout: Int,
          updates: Seq[(Long, Long, Long)] /* (h, t, weight) */): Seq[Row] = {
    import spark.implicits._
    val e0 = ZSet.fromSet(SynthGraph.layeredEdges(spark, layers, width, fanout)).compact()

    val itc = new IncrementalTransitiveClosure(spark)
    val (_, bulk) = itc.step(e0)
    val bulkRow = Row("bulk load", -1, bulk.totalDelta, -1, -1, -1)

    var eAcc = e0
    val rows = updates.map { case (h, t, w) =>
      val dE = ZSet.raw(Seq((h, t, w)).toDF("h", "t", ZSet.W))
      val ((dR, stats), incMs) = Report.timed(itc.step(dE))
      val dRows = dR.entryCount
      eAcc = eAcc.plus(dE).compact()
      val ((_, sstats), scratchMs) = Report.timed(TransitiveClosure.semiNaive(eAcc))
      val sign = if (w > 0) "+" else "−"
      Row(s"$sign($h→$t)", incMs, stats.totalDelta, scratchMs, sstats.totalWork, dRows)
    }
    bulkRow +: rows
  }

  val headers: Seq[String] = Seq("update", "incremental ms", "inc tuples",
    "from-scratch ms", "scratch tuples", "|Δview|")

  def render(rows: Seq[Row]): Seq[Seq[String]] = rows.map { r =>
    def m(v: Double) = if (v < 0) "-" else Report.f1(v)
    def c(v: Long) = if (v < 0) "-" else v.toString
    Seq(r.update, m(r.incMs), c(r.incTuples), m(r.scratchMs), c(r.scratchTuples), c(r.viewDelta))
  }

  def emit(rows: Seq[Row]): Unit =
    Report.emit("E5 — incremental recursive query (§6.1 circuit) vs recompute", headers, render(rows))
}
