package repro.zset

import scala.util.Random

import org.apache.spark.sql.functions.col

import repro.{SparkSpec, ZSetFixtures}

/** Randomized (seeded) checks of the Z-set laws the optimizer relies on:
  * Propositions 4.5 and 4.6, distinct/positivity interactions, and the
  * monotonicity statement of Definition 4.4.
  */
class ZSetLawsSpec extends SparkSpec with ZSetFixtures {

  private val Trials = 6

  private def randZ(rnd: Random, positive: Boolean): ZSet = {
    val entries = (0 until (1 + rnd.nextInt(5))).map { _ =>
      val k = rnd.nextInt(6).toLong
      val w = if (positive) 1L + rnd.nextInt(3) else rnd.nextInt(7) - 3L
      k -> w
    }.filter(_._2 != 0L)
    if (entries.isEmpty) zs1("k", 0L -> 1L) else zs1("k", entries: _*)
  }

  private def randZ2(rnd: Random, positive: Boolean): ZSet = {
    val entries = (0 until (1 + rnd.nextInt(5))).map { _ =>
      val k = rnd.nextInt(4).toLong
      val v = rnd.nextInt(3).toLong
      val w = if (positive) 1L + rnd.nextInt(3) else rnd.nextInt(7) - 3L
      (k, v) -> w
    }.filter(_._2 != 0L)
    if (entries.isEmpty) zs2("k", "v", (0L, 0L) -> 1L) else zs2("k", "v", entries: _*)
  }

  test("Prop 4.5: σ(distinct(i)) = distinct(σ(i)) for positive i") {
    val rnd = new Random(1)
    for (_ <- 0 until Trials) {
      val i = randZ(rnd, positive = true)
      val lhs = i.distinctZ.filterZ(col("k") % 2 === 0)
      val rhs = i.filterZ(col("k") % 2 === 0).distinctZ
      assert(lhs.zequals(rhs))
    }
  }

  test("Prop 4.5: ⋈(distinct(a), distinct(b)) = distinct(a ⋈ b) for positive a, b") {
    val rnd = new Random(2)
    for (_ <- 0 until Trials) {
      val a = randZ2(rnd, positive = true)
      val b = randZ(rnd, positive = true)
      val lhs = a.distinctZ.join(b.distinctZ, Seq("k"))
      val rhs = a.join(b, Seq("k")).distinctZ
      assert(lhs.zequals(rhs))
    }
  }

  test("Prop 4.6: distinct(σ(distinct(i))) = distinct(σ(i)) for positive i") {
    val rnd = new Random(3)
    for (_ <- 0 until Trials) {
      val i = randZ(rnd, positive = true)
      val lhs = i.distinctZ.filterZ(col("k") > 1).distinctZ
      val rhs = i.filterZ(col("k") > 1).distinctZ
      assert(lhs.zequals(rhs))
    }
  }

  test("Prop 4.6: distinct(π(distinct(i))) = distinct(π(i)) for positive i") {
    val rnd = new Random(4)
    for (_ <- 0 until Trials) {
      val i = randZ2(rnd, positive = true)
      val lhs = i.distinctZ.project("v").distinctZ
      val rhs = i.project("v").distinctZ
      assert(lhs.zequals(rhs))
    }
  }

  test("Prop 4.6: distinct(distinct(a) + distinct(b)) = distinct(a + b) for positive a, b") {
    val rnd = new Random(5)
    for (_ <- 0 until Trials) {
      val a = randZ(rnd, positive = true)
      val b = randZ(rnd, positive = true)
      val lhs = a.distinctZ.plus(b.distinctZ).distinctZ
      val rhs = a.plus(b).distinctZ
      assert(lhs.zequals(rhs))
    }
  }

  test("counterexample: absorbing distinct through a difference is unsound") {
    // distinct(distinct(x) − b) ≠ distinct(x − b) with x = {v↦3}, b = {v↦1}.
    val x = zs1("k", 7L -> 3L)
    val b = zs1("k", 7L -> 1L)
    val lhs = x.distinctZ.minus(b).distinctZ
    val rhs = x.minus(b).distinctZ
    assert(lhs.isEmpty)
    assert(entriesOf(rhs) == Set((Seq("7"), 1L)))
  }

  test("Def 4.4: integrating a positive stream yields a monotone stream") {
    val rnd = new Random(6)
    val deltas = Seq.fill(5)(randZ(rnd, positive = true))
    var acc = deltas.head
    for (d <- deltas.tail) {
      val next = acc.plus(d)
      assert(next.minus(acc).isPositive) // next ≥ acc
      acc = next
    }
  }

  test("negative weights remove elements through distinct") {
    val i = zs1("k", 1L -> 1L, 2L -> 1L)
    val delta = zs1("k", 2L -> -1L)
    assert(entriesOf(i.plus(delta).distinctZ) == Set((Seq("1"), 1L)))
  }
}
