package repro.harness.experiments

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.harness.{Changes, Report}
import repro.relational.Rel._
import repro.relational.{Incrementalizer, Rel}
import repro.zset.ZSet

/** Experiment T1 — the Table 1 operator matrix at benchmark scale: every
  * relational operator is maintained incrementally over a change stream
  * (inserts + deletes) and checked tick-by-tick against the naïve lifted
  * circuit. Reports per-tick cost for both and a correctness verdict.
  */
object T1OperatorMatrix {

  final case class Row(op: String, ticks: Int, incMsPerTick: Double,
                       naiveMsPerTick: Double, viewRows: Long, ok: Boolean)

  private def operators: Seq[(String, Rel)] = Seq(
    "σ (WHERE)"        -> Select(Table("ta"), "x % 7 < 3"),
    "π (DISTINCT col)" -> Project(Table("ta"), Seq("y")),
    "map (expr)"       -> Project(Table("ta"), Seq("x + y AS s")),
    "∪ (UNION)"        -> Union(Table("ta"), Table("tb")),
    "∪ALL"             -> UnionAll(Table("ta"), Table("tb")),
    "∩ (INTERSECT)"    -> Intersect(Table("ta"), Table("tb")),
    "\\ (EXCEPT)"      -> Except(Table("ta"), Table("tb")),
    "⋈ (JOIN)"         -> Join(Table("ta"), Table("tc"), Seq("y")),
    "▷ (ANTIJOIN)"     -> AntiJoin(Table("ta"), Table("tc"), Seq("y")),
    "distinct"         -> Distinct(UnionAll(Table("ta"), Table("tb"))))

  def run(spark: SparkSession, baseRows: Long, ticks: Int): Seq[Row] = {
    import repro.SynthData
    val ta = ZSet.fromSet(SynthData.uniformKeys(spark, baseRows, baseRows / 2, seed = 101)
      .select(col("k") as "x", (col("v") * 500).cast("long") as "y"))
    val tb = ZSet.fromSet(SynthData.uniformKeys(spark, baseRows, baseRows / 2, seed = 102)
      .select(col("k") as "x", (col("v") * 500).cast("long") as "y"))
    val tc = ZSet.fromSet(SynthData.uniformKeys(spark, baseRows / 4, 500, seed = 103)
      .select(col("k") as "y", (col("v") * 10000).cast("long") as "z"))
    val inputs = Map("ta" -> ta, "tb" -> tb, "tc" -> tc)

    operators.map { case (name, q) =>
      val needed = q.inputsOf
      val streams = needed.map(n => n -> Changes.stream(inputs(n), ticks,
        initialFrac = 0.7, deleteFrac = 0.15, seed = n.hashCode.toLong)).toMap
      val inc = Incrementalizer.incremental(q)
      val naive = Incrementalizer.naive(q)
      var ok = true
      var incTotal = 0.0
      var naiveTotal = 0.0
      var view: Option[ZSet] = None
      for (t <- 0 until ticks) {
        val dmap = streams.map { case (n, s) => n -> s(t) }
        val (dInc, ms1) = Report.timed(inc.step(dmap).compact())
        val (dNaive, ms2) = Report.timed(naive.step(dmap))
        incTotal += ms1; naiveTotal += ms2
        if (!dInc.zequals(dNaive)) ok = false
        view = Some(view.map(_.plus(dInc).compact()).getOrElse(dInc))
      }
      Row(name, ticks, incTotal / ticks, naiveTotal / ticks,
        view.map(_.entryCount).getOrElse(0L), ok)
    }
  }

  val headers: Seq[String] =
    Seq("operator", "ticks", "inc ms/tick", "naive ms/tick", "|view|", "inc ≡ naive")

  def render(rows: Seq[Row]): Seq[Seq[String]] = rows.map { r =>
    Seq(r.op, r.ticks.toString, Report.f1(r.incMsPerTick), Report.f1(r.naiveMsPerTick),
      r.viewRows.toString, if (r.ok) "✓" else "✗ MISMATCH")
  }

  def emit(rows: Seq[Row]): Unit =
    Report.emit("T1 — Table 1 operator matrix (incremental vs naïve lifted)", headers, render(rows))

  implicit private class RelInputs(q: Rel) {
    def inputsOf: Set[String] = q match {
      case Table(n)          => Set(n)
      case Select(in, _)     => in.inputsOf
      case Project(in, _)    => in.inputsOf
      case Distinct(in)      => in.inputsOf
      case Union(a, b)       => a.inputsOf ++ b.inputsOf
      case UnionAll(a, b)    => a.inputsOf ++ b.inputsOf
      case Intersect(a, b)   => a.inputsOf ++ b.inputsOf
      case Except(a, b)      => a.inputsOf ++ b.inputsOf
      case Cross(a, b)       => a.inputsOf ++ b.inputsOf
      case Join(a, b, _)     => a.inputsOf ++ b.inputsOf
      case AntiJoin(a, b, _) => a.inputsOf ++ b.inputsOf
    }
  }
}
