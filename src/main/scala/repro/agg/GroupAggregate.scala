package repro.agg

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.circuit.Op
import repro.zset.ZSet

/** Aggregation functions over Z-sets (§7.2). COUNT and SUM are *linear*
  * maps from Z[A] into the result group; MIN is not (deletions may need the
  * full set), so its incremental form is brute force over the stored
  * integral — exactly the paper's distinction.
  */
sealed trait AggFunc { def alias: String }
object AggFunc {
  /** a_COUNT(s) = Σ_x s[x] — linear. */
  final case class Count(alias: String = "cnt") extends AggFunc
  /** a_SUM(s) = Σ_x x·s[x] — linear. */
  final case class Sum(col: String, alias: String = "total") extends AggFunc
  /** AVG = SUM/COUNT of a linear pair, divided at output (§7.2's circuit). */
  final case class Avg(col: String, alias: String = "avg") extends AggFunc
  /** MIN — non-linear, incremental only by brute force (§7.2). */
  final case class Min(col: String, alias: String = "mn") extends AggFunc
}

/** GROUP BY-AGGREGATE (§7.4) over the flat encoding of indexed Z-sets
  * (§7.3): the grouping function G_p is the linear operator that tags each
  * tuple with its key columns, so a grouping is just the set of tuples
  * sharing a key.
  */
object GroupAggregate {

  /** Weighted accumulator columns for the linear part of an aggregate. */
  private[agg] def accExprs(f: AggFunc): Seq[Column] = {
    val w = col(ZSet.W)
    f match {
      case AggFunc.Count(_)   => Seq(sum(w) as "__cnt")
      case AggFunc.Sum(c, _)  => Seq(sum(w) as "__cnt", sum(col(c).cast("double") * w) as "__sm")
      case AggFunc.Avg(c, _)  => Seq(sum(w) as "__cnt", sum(col(c).cast("double") * w) as "__sm")
      case AggFunc.Min(c, _)  => Seq(sum(w) as "__cnt", min(when(w > 0, col(c))) as "__mn")
    }
  }

  /** Render the output value column from the accumulators. */
  private[agg] def render(f: AggFunc): Column = f match {
    case AggFunc.Count(_)  => col("__cnt")
    case AggFunc.Sum(_, _) => col("__sm")
    case AggFunc.Avg(_, _) => col("__sm") / col("__cnt")
    case AggFunc.Min(_, _) => col("__mn")
  }

  /** Batch reference: `SELECT keys, f FROM z GROUP BY keys` as a Z-set view
    * (weight 1 per group; empty groups absent). Requires positive input for
    * MIN (set/bag semantics), like SQL.
    */
  def batch(z: ZSet, keys: Seq[String], f: AggFunc): ZSet = {
    val c = z.consolidate().df
    val grouped = c.groupBy(keys.map(col): _*).agg(accExprs(f).head, accExprs(f).tail: _*)
    val rows = grouped
      .where(col("__cnt") =!= 0)
      .select((keys.map(col) :+ (render(f) as f.alias)): _*)
    ZSet.fromSet(rows)
  }
}

/** The incremental GROUP BY-AGGREGATE operator: per tick it aggregates only
  * the *change*, merges it into per-group accumulator state, and emits the
  * view delta (retraction of the old group row + assertion of the new one)
  * for *groupings that changed* — §7.4's "partly incremental" evaluation.
  *
  * For linear aggregates (COUNT/SUM/AVG) the state is one accumulator row
  * per group. For MIN the full input integral is kept and the touched
  * groups' minima recomputed from it — the paper's brute-force fallback.
  */
final class IncrementalGroupAggregate(keys: Seq[String], f: AggFunc)
    extends Op[ZSet, ZSet] {
  require(keys.nonEmpty, "use IncrementalScalarAggregate for global aggregates")

  private val W = ZSet.W
  private var acc: Option[DataFrame] = None                    // keys ++ accumulators (linear only)
  private var integral: Option[repro.zset.Accumulator] = None  // full input integral (MIN only)
  private var view: Option[ZSet] = None                        // current output view (for retractions)

  private def isLinear: Boolean = f match {
    case _: AggFunc.Min => false
    case _              => true
  }

  def step(d: ZSet): ZSet = {
    val spark = d.spark
    // One aggregation of the change gives both the per-group delta and the
    // touched-key set (its key column is already unique).
    val dAgg = d.df.groupBy(keys.map(col): _*)
      .agg(GroupAggregate.accExprs(f).head, GroupAggregate.accExprs(f).tail: _*)
      .localCheckpoint()
    val touched = broadcast(dAgg.select(keys.map(col): _*))

    // New accumulator rows for the touched groups.
    val newTouched: DataFrame =
      if (isLinear) {
        acc match {
          case None => dAgg
          case Some(st) =>
            val oldTouched = st.join(touched, keys.toSeq, "left_semi")
            val accs = sumAccs()
            oldTouched.unionByName(dAgg)
              .groupBy(keys.map(col): _*)
              .agg(accs.head, accs.tail: _*)
        }
      } else {
        // MIN: recompute touched groups from the updated integral, restricted
        // to the touched keys first (broadcast semi-join ≈ indexed lookup).
        val a = integral.getOrElse {
          val x = repro.zset.Accumulator.empty(spark, d.dataSchema); integral = Some(x); x
        }
        a.add(d.compact())
        val restricted = a.value.df.join(touched, keys.toSeq, "left_semi")
        ZSet.raw(restricted).consolidate().df
          .groupBy(keys.map(col): _*)
          .agg(GroupAggregate.accExprs(f).head, GroupAggregate.accExprs(f).tail: _*)
      }

    // One row per touched group — weight 1, no extra distinct needed.
    val newRows = ZSet.raw(
      newTouched
        .where(col("__cnt") =!= 0)
        .select((keys.map(col) :+ (GroupAggregate.render(f) as f.alias)): _*)
        .withColumn(ZSet.W, lit(1L)))

    val oldView = view.getOrElse(ZSet.empty(spark, newRows.dataSchema))
    val oldRows = ZSet.raw(
      oldView.df.join(touched, keys.toSeq, "left_semi"))

    val out = newRows.minus(oldRows).compact()

    if (isLinear) {
      val untouched = acc.map(_.join(touched, keys.toSeq, "left_anti"))
      val merged = untouched.map(_.unionByName(newTouched)).getOrElse(newTouched)
      acc = Some(merged.where(col("__cnt") =!= 0).coalesce(8).localCheckpoint())
    }
    view = Some(oldView.plus(out).compact())
    out
  }

  private def sumAccs(): Seq[Column] = f match {
    case AggFunc.Count(_) => Seq(sum(col("__cnt")) as "__cnt")
    case _                => Seq(sum(col("__cnt")) as "__cnt", sum(col("__sm")) as "__sm")
  }
}

/** Global (non-grouped) aggregates (§7.2): the linear aggregation followed by
  * `makeset` to produce a singleton Z-set. Linear accumulators update in
  * O(|change|); `(↑makeset)^Δ` is the retract/assert pair on the singleton.
  * MIN keeps the full integral and recomputes (brute force).
  */
final class IncrementalScalarAggregate(f: AggFunc) extends Op[ZSet, ZSet] {
  private var cnt: Long = 0L
  private var sm: Double = 0.0
  private var integral: Option[ZSet] = None
  private var prevRow: Option[ZSet] = None

  def step(d: ZSet): ZSet = {
    val spark = d.spark
    f match {
      case _: AggFunc.Min =>
        val next = integral.map(_.plus(d)).getOrElse(d).compact()
        integral = Some(next)
      case _ =>
        val r = d.df.agg(
          coalesce(sum(col(ZSet.W)), lit(0L)),
          f match {
            case AggFunc.Sum(c, _) => coalesce(sum(col(c).cast("double") * col(ZSet.W)), lit(0.0))
            case AggFunc.Avg(c, _) => coalesce(sum(col(c).cast("double") * col(ZSet.W)), lit(0.0))
            case _                 => lit(0.0)
          }).head()
        cnt += r.getLong(0)
        sm += r.getDouble(1)
    }

    val newRow: ZSet = f match {
      case AggFunc.Count(a) =>
        if (cnt == 0) emptyOut(spark, a, longTyped = true)
        else ZSet.fromSet(spark.range(1).select(lit(cnt) as a))
      case AggFunc.Sum(_, a) =>
        if (cnt == 0) emptyOut(spark, a, longTyped = false)
        else ZSet.fromSet(spark.range(1).select(lit(sm) as a))
      case AggFunc.Avg(_, a) =>
        if (cnt == 0) emptyOut(spark, a, longTyped = false)
        else ZSet.fromSet(spark.range(1).select(lit(sm / cnt) as a))
      case AggFunc.Min(c, a) =>
        val i = integral.get.consolidate().df
        val m = i.where(col(ZSet.W) > 0).agg(min(col(c)) as a)
        ZSet.fromSet(m.where(col(a).isNotNull))
    }

    val old = prevRow.getOrElse(ZSet.empty(spark, newRow.dataSchema))
    val out = newRow.minus(old).consolidate()
    prevRow = Some(newRow.compact())
    out
  }

  private def emptyOut(spark: org.apache.spark.sql.SparkSession, a: String, longTyped: Boolean): ZSet = {
    val df =
      if (longTyped) spark.range(1).select(lit(0L) as a).where(lit(false))
      else spark.range(1).select(lit(0.0) as a).where(lit(false))
    ZSet.fromSet(df)
  }
}
