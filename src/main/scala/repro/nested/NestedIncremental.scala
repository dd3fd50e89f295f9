package repro.nested

import scala.collection.mutable

import org.apache.spark.sql.functions._

import repro.algebra.Group
import repro.zset.ZSet

/** The doubly-incremental bilinear operator `(↑(↑×)^Δ)^Δ` of §6, in the
  * simplified 4-term form (the paper notes the 3×3 expansion collapses to 4
  * terms; the derivation, using 1 + z⁻¹I = I at each level, gives):
  * {{{
  *   out = IᵢIₒ(a) × b  +  Iₒ(a) × Zᵢ(b)  +  Iᵢ(a) × Zₒ(b)  +  a × ZᵢZₒ(b)
  * }}}
  * where Iᵢ/Iₒ are inner/outer integration and Zᵢ = ↑z⁻¹∘↑I, Zₒ = z⁻¹∘I.
  * Every term pairs an integral with a change-sized operand, realizing the
  * §6.2 complexity bound O(‖↑I(s₁)‖ × ‖I(s₂)‖) instead of a full recompute.
  */
final class NestedIncrementalBilinear[A, B, C](times: (A, B) => C)(
    implicit ga: Group[A], gb: Group[B], gc: Group[C]) {

  private val ioA   = new OuterIntegrate[A]          // Iₒ(a)
  private val iiIoA = new InnerIntegrate[A]          // Iᵢ(Iₒ(a))
  private val iiA   = new InnerIntegrate[A]          // Iᵢ(a)
  private val ziB   = new InnerDelayedIntegrate[B]   // Zᵢ(b)
  private val zoB   = new OuterDelayedIntegrate[B]   // Zₒ(b)
  private val ziZoB = new InnerDelayedIntegrate[B]   // Zᵢ(Zₒ(b))

  def newOuterTick(): Unit = {
    ioA.newOuterTick(); iiIoA.newOuterTick(); iiA.newOuterTick()
    ziB.newOuterTick(); zoB.newOuterTick(); ziZoB.newOuterTick()
  }

  def step(a: A, b: B): C = {
    val ioAv   = ioA.step(a)
    val iiIoAv = iiIoA.step(ioAv)
    val iiAv   = iiA.step(a)
    val ziBv   = ziB.step(b)
    val zoBv   = zoB.step(b)
    val ziZoBv = ziZoB.step(zoBv)
    gc.plus(
      gc.plus(times(iiIoAv, b), times(ioAv, ziBv)),
      gc.plus(times(iiAv, zoBv), times(a, ziZoBv)))
  }
}

/** Brute-force doubly-incremental unary operator: D ∘ ↑D ∘ ↑↑f ∘ ↑I ∘ I
  * (§6.2's "unoptimized loop body"). Reference implementation for tests and
  * the baseline measured in experiment E5.
  */
final class NestedIncrementalUnaryBrute[A, B](f: A => B)(
    implicit ga: Group[A], gb: Group[B]) {
  private val io = new OuterIntegrate[A]
  private val ii = new InnerIntegrate[A]
  private val di = new InnerDifferentiate[B]
  private val dd = new OuterDifferentiate[B]

  def newOuterTick(): Unit = {
    io.newOuterTick(); ii.newOuterTick(); di.newOuterTick(); dd.newOuterTick()
  }

  def step(a: A): B = dd.step(di.step(f(ii.step(io.step(a)))))
}

/** Brute-force doubly-incremental binary operator (each input integrated at
  * both levels, output differentiated at both levels).
  */
final class NestedIncrementalBinaryBrute[A, B, C](f: (A, B) => C)(
    implicit ga: Group[A], gb: Group[B], gc: Group[C]) {
  private val ioA = new OuterIntegrate[A]
  private val iiA = new InnerIntegrate[A]
  private val ioB = new OuterIntegrate[B]
  private val iiB = new InnerIntegrate[B]
  private val di  = new InnerDifferentiate[C]
  private val dd  = new OuterDifferentiate[C]

  def newOuterTick(): Unit = {
    ioA.newOuterTick(); iiA.newOuterTick(); ioB.newOuterTick(); iiB.newOuterTick()
    di.newOuterTick(); dd.newOuterTick()
  }

  def step(a: A, b: B): C =
    dd.step(di.step(f(iiA.step(ioA.step(a)), iiB.step(ioB.step(b)))))
}

/** The doubly-incremental distinct `(↑(↑distinct)^Δ)^Δ` of §6 (expanded in
  * Figure 2 via Proposition 4.7).
  *
  * Writing c(t₁,t₂) for the fully-integrated input and f(v) = [v > 0], the
  * output at (t₁,t₂) is the double difference
  * {{{
  *   out[x] = (f(c₁₁[x]) − f(c₁₀[x])) − (f(c₀₁[x]) − f(c₀₀[x]))
  * }}}
  * over the four corners c₁₁ = c(t₁,t₂), c₁₀ = c(t₁,t₂−1), c₀₁ = c(t₁−1,t₂),
  * c₀₀ = c(t₁−1,t₂−1). A key can only contribute when one of the two
  * *column deltas* e₁ = c₁₁−c₁₀ = I(d)[t₁][t₂] or e₀ = c₀₁−c₀₀ =
  * I(d)[t₁−1][t₂] is non-zero on it, so the work per step is proportional to
  * the size of those changes — while the stored per-iteration integrals give
  * the §6.2 space bound (proportional to iterations × relation size).
  */
final class NestedIncrementalDistinct(implicit g: Group[ZSet]) {
  // Outer integral of the input per inner index; read-before-update gives e₀.
  private val ioD = mutable.ArrayBuffer.empty[ZSet]
  // Fully-integrated input per inner index, previous outer tick: c(t₁−1, j).
  private var prevCum: IndexedSeq[ZSet] = IndexedSeq.empty
  private val curCum = mutable.ArrayBuffer.empty[ZSet]
  private var t2 = 0

  def newOuterTick(): Unit = {
    prevCum = curCum.toIndexedSeq
    curCum.clear()
    t2 = 0
  }

  /** c(t₁−1, j): after its own convergence a row's cumulative is constant,
    * so reads past the recorded prefix clamp to the last value.
    */
  private def prevAt(j: Int): ZSet =
    if (j < 0 || prevCum.isEmpty) g.zero
    else prevCum(math.min(j, prevCum.size - 1))

  def step(d: ZSet): ZSet = {
    val e0 = if (t2 < ioD.size) ioD(t2) else g.zero
    val e1 = g.compact(g.plus(e0, d))
    if (t2 < ioD.size) ioD(t2) = e1 else ioD += e1

    val c10 = if (t2 == 0) g.zero else curCum(t2 - 1)
    val c00 = prevAt(t2 - 1)

    val out = NestedIncrementalDistinct.doubleH(c10, c00, e1, e0)

    curCum += g.compact(g.plus(c10, e1))
    t2 += 1
    out
  }
}

object NestedIncrementalDistinct {
  /** Evaluate the double difference of f over the four corners, restricted to
    * the union of the supports of e₁ and e₀ (c₁₁ = c₁₀+e₁, c₀₁ = c₀₀+e₀).
    */
  def doubleH(c10: ZSet, c00: ZSet, e1: ZSet, e0: ZSet): ZSet = {
    val W = ZSet.W
    val keys = e1.dataCols
    // Candidate keys: anything either column delta touches, weight 1.
    val cand = support(e1).plus(support(e0)).distinctZ.df.drop(W)

    // Restrict the big cumulative corners to the candidate keys first
    // (broadcast semi-join ≈ indexed lookup), then aggregate the small rest.
    def ren(z: ZSet, n: String) = {
      val restricted = z.df.join(broadcast(cand), keys, "left_semi")
      broadcast(ZSet.raw(restricted).consolidate().df.withColumnRenamed(W, n))
    }
    val joined = cand
      .join(ren(c10, "__c10"), keys, "left_outer")
      .join(ren(c00, "__c00"), keys, "left_outer")
      .join(ren(e1, "__e1"), keys, "left_outer")
      .join(ren(e0, "__e0"), keys, "left_outer")

    val w10 = coalesce(col("__c10"), lit(0L))
    val w00 = coalesce(col("__c00"), lit(0L))
    val w11 = w10 + coalesce(col("__e1"), lit(0L))
    val w01 = w00 + coalesce(col("__e0"), lit(0L))
    def f(v: org.apache.spark.sql.Column) = when(v > 0, 1L).otherwise(0L)
    val weight = (f(w11) - f(w10)) - (f(w01) - f(w00))

    ZSet.raw(
      joined
        .withColumn(W, weight)
        .drop("__c10", "__c00", "__e1", "__e0")
        .where(col(W) =!= 0))
  }

  private def support(z: ZSet): ZSet =
    ZSet.raw(z.consolidate().df.withColumn(ZSet.W, lit(1L)))
}
