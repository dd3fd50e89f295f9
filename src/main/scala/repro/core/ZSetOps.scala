package repro.core

import org.apache.spark.sql.functions._

import repro.circuit.{Op, Op2}
import repro.zset.ZSet

/** Lifted (per-tick) Z-set operators — the `↑f` boxes of the paper's circuits.
  * Linear operators are their own incremental versions (Theorem 3.3), so the
  * same instances appear unchanged in incremental circuits.
  */
object ZSetOps {

  /** ↑σ — selection by a SQL predicate over the data columns. Linear. */
  def filter(predicate: String): Op[ZSet, ZSet] =
    Op.lift(z => z.filterZ(expr(predicate)))

  /** ↑π — projection onto named columns. Linear. */
  def project(cols: String*): Op[ZSet, ZSet] =
    Op.lift(z => z.project(cols: _*))

  /** ↑map — generalized projection via "expr AS alias" SQL expressions. Linear. */
  def map(exprs: String*): Op[ZSet, ZSet] =
    Op.lift(z => z.mapRows(exprs: _*))

  /** ↑+ — Z-set addition (UNION ALL, §7.1). Linear in both arguments. */
  def add: Op2[ZSet, ZSet, ZSet] = Op.lift2((a, b) => a.plus(b))

  /** ↑− — Z-set difference (the group operation, not set EXCEPT). */
  def subtract: Op2[ZSet, ZSet, ZSet] = Op.lift2((a, b) => a.minus(b))

  /** ↑distinct — Definition 4.3. NOT linear; see [[IncrementalDistinct]]. */
  def distinct: Op[ZSet, ZSet] = Op.lift(_.distinctZ)

  /** ↑⋈ — equi-join; bilinear (weights multiply). See [[IncrementalJoin]]. */
  def join(keys: Seq[String]): Op2[ZSet, ZSet, ZSet] =
    Op.lift2((a, b) => a.join(b, keys))

  /** ↑× — Cartesian product; bilinear. */
  def cartesian: Op2[ZSet, ZSet, ZSet] = Op.lift2((a, b) => a.cartesian(b))
}
