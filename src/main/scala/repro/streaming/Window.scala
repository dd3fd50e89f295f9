package repro.streaming

import org.apache.spark.sql.functions._

import repro.algebra.Group
import repro.circuit.{Op, Op2}
import repro.zset.ZSet

/** Physical-timestamp windowing (§7.6.1): `SELECT * FROM events [RANGE w]`.
  *
  * The window operator W prunes a Z-set to values whose timestamp is within
  * `width` of the current time θ. With θ increasing monotonically, W commutes
  * into the integration loop, so the maintained state is only the *window
  * contents* — bounded memory over an unbounded stream (the right-hand
  * circuit of §7.6.1).
  */
final class WindowIntegrate(tsCol: String, width: Double) extends Op2[ZSet, Double, ZSet] {
  private var state: Option[ZSet] = None

  /** Rows currently retained — the bounded-memory claim measured in E7. */
  def stateSize: Long = state.map(_.entryCount).getOrElse(0L)

  /** Returns the window contents (a snapshot stream, like the paper's o). */
  def step(d: ZSet, theta: Double): ZSet = {
    val merged = state.map(_.plus(d)).getOrElse(d)
    val pruned = merged.filterZ(col(tsCol).cast("double") >= lit(theta - width)).compact()
    state = Some(pruned)
    pruned
  }
}

object WindowIntegrate {
  /** Brute-force reference (left-hand circuit): W applied to the full
    * integral I(v) — unbounded state.
    */
  def bruteForce(integral: ZSet, tsCol: String, width: Double, theta: Double): ZSet =
    integral.filterZ(col(tsCol).cast("double") >= lit(theta - width))
}

/** The fixed-size sliding-window aggregate of §7.6.1 — a convolution filter:
  * out[t] = Σ_{j<taps} Tⱼ(s[t−j]), here with identity taps (a moving sum over
  * the last `taps` stream values), built from a z⁻¹ chain.
  */
final class Convolution[A](taps: Int)(implicit g: Group[A]) extends Op[A, A] {
  require(taps >= 1)
  private val buf = scala.collection.mutable.Queue.empty[A]

  def step(a: A): A = {
    buf.enqueue(g.compact(a))
    if (buf.size > taps) buf.dequeue()
    buf.foldLeft(g.zero)(g.plus)
  }
}
