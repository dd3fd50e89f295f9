package repro.harness.experiments

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.SynthData
import repro.agg.{AggFunc, GroupAggregate, IncrementalGroupAggregate}
import repro.harness.Report
import repro.streaming.WindowIntegrate
import repro.zset.ZSet

/** Experiment E6 — §7.2–7.4: incremental GROUP BY-AGGREGATE. Linear
  * aggregates (SUM) are maintained from per-group accumulators; MIN needs
  * the stored integral of the touched groups (brute force); both are
  * compared against a full batch recompute on every change.
  */
object E6Aggregates {

  final case class Row(agg: String, deltaRows: Long, baseRows: Long, groups: Long,
                       incMs: Double, fullMs: Double)

  def run(spark: SparkSession, sf: Double, deltaSizes: Seq[Long]): Seq[Row] = {
    val li = SynthData.lineitem(spark, sf)
      .select("l_partkey", "l_quantity", "l_orderkey")
      .localCheckpoint()
    val n = li.count()
    val keys = Seq("l_partkey")

    (for (c <- deltaSizes; (name, f) <- Seq(
        ("SUM (linear)", AggFunc.Sum("l_quantity")),
        ("MIN (brute force)", AggFunc.Min("l_quantity")))) yield {
      val init = ZSet.fromBag(li)
      // Measured changes: three disjoint fresh batches of c rows each.
      val deltas = (0 until 3).map { r =>
        ZSet.fromBag(SynthData.lineitem(spark, sf = c.toDouble / 6e6, seed = 100 + r)
          .select("l_partkey", "l_quantity", "l_orderkey")).compact()
      }
      val inc = new IncrementalGroupAggregate(keys, f)
      inc.step(init).entryCount                              // bulk load
      inc.step(ZSet.empty(spark, init.dataSchema)).entryCount // warm-up
      val (_, incMs) = Report.timedBest(deltas.map(d => () => inc.step(d).physicalCount))
      val full = deltas.foldLeft(init)(_ plus _).compact()
      val (groups, fullMs) = Report.timedBest(Seq.fill(2)(() =>
        GroupAggregate.batch(full, keys, f).physicalCount))
      Row(name, c, n, groups, incMs, fullMs)
    }).toSeq
  }

  val headers: Seq[String] =
    Seq("aggregate", "ΔC (rows)", "R (rows)", "groups", "incremental ms", "recompute ms", "speedup")

  def render(rows: Seq[Row]): Seq[Seq[String]] = rows.map { r =>
    Seq(r.agg, r.deltaRows.toString, r.baseRows.toString, r.groups.toString,
      Report.f1(r.incMs), Report.f1(r.fullMs), Report.f2(r.fullMs / r.incMs))
  }

  def emit(rows: Seq[Row]): Unit =
    Report.emit("E6 — incremental GROUP BY aggregates (§7.2–7.4)", headers, render(rows))
}

/** Experiment E7 — §7.6.1: window queries with W pushed inside integration.
  * Events stream in with monotonically increasing timestamps; the windowed
  * circuit's state stays bounded at the window size while the unbounded
  * integral grows linearly — same output, constant-ish per-tick cost.
  */
object E7Window {

  final case class Row(tick: Int, arrived: Long, windowState: Long, integralRows: Long,
                       windowMs: Double, bruteMs: Double)

  def run(spark: SparkSession, ticks: Int, rowsPerTick: Long, width: Double): Seq[Row] = {
    val w = new WindowIntegrate("ts", width)
    var integral: Option[ZSet] = None
    (0 until ticks).map { t =>
      val theta = (t + 1).toDouble * 10
      val d = ZSet.fromBag(
        SynthData.uniformKeys(spark, rowsPerTick, nKeys = 1000, seed = t)
          .select((lit(theta - 10) + col("v") * 10) as "ts", col("k") as "v"))
        .compact()
      val (st, windowMs) = Report.timed { w.step(d, theta); w.stateSize }
      integral = Some(integral.map(_.plus(d)).getOrElse(d).compact())
      val (_, bruteMs) = Report.timed(
        WindowIntegrate.bruteForce(integral.get, "ts", width, theta).entryCount)
      Row(t, (t + 1) * rowsPerTick, st, integral.get.entryCount, windowMs, bruteMs)
    }
  }

  val headers: Seq[String] =
    Seq("tick", "events so far", "window state rows", "integral rows (brute)", "window ms", "brute ms")

  def render(rows: Seq[Row]): Seq[Seq[String]] = rows.map { r =>
    Seq(r.tick.toString, r.arrived.toString, r.windowState.toString,
      r.integralRows.toString, Report.f1(r.windowMs), Report.f1(r.bruteMs))
  }

  def emit(rows: Seq[Row]): Unit =
    Report.emit("E7 — bounded-state window queries (§7.6.1)", headers, render(rows))
}
