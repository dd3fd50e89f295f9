package repro.nested

import scala.util.Random

import org.apache.spark.sql.types._

import repro.algebra.Group
import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

/** The doubly-incremental distinct `(↑(↑distinct)^Δ)^Δ` (Figure 2's largest
  * sub-circuit) against the brute-force D ∘ ↑D ∘ ↑↑distinct ∘ ↑I ∘ I.
  */
class NestedIncDistinctSpec extends SparkSpec with ZSetFixtures {

  private val schema = StructType(Seq(StructField("k", LongType, nullable = false)))
  private implicit lazy val g: Group[ZSet] = ZSet.group(spark, schema)

  private def randDelta(rnd: Random): ZSet = {
    val n = rnd.nextInt(3)
    if (n == 0) ZSet.empty(spark, schema)
    else zs1("k", Seq.fill(n)((rnd.nextInt(4).toLong, rnd.nextInt(5) - 2L)).filter(_._2 != 0L): _*)
  }

  private def runBoth(matrix: Seq[Seq[ZSet]]): Unit = {
    val opt = new NestedIncrementalDistinct
    val brute = new NestedIncrementalUnaryBrute[ZSet, ZSet](_.distinctZ)
    matrix.zipWithIndex.foreach { case (row, t1) =>
      opt.newOuterTick(); brute.newOuterTick()
      row.zipWithIndex.foreach { case (d, t2) =>
        val o = opt.step(d)
        val b = brute.step(d)
        assert(o.zequals(b), s"mismatch at ($t1, $t2): opt=${o.entries()} brute=${b.entries()}")
      }
    }
  }

  test("≡ brute force on randomized rectangular nested change streams") {
    val rnd = new Random(41)
    for (trial <- 0 until 3) {
      val rows = 2 + rnd.nextInt(2)
      val cols = 2 + rnd.nextInt(2)
      runBoth(Seq.fill(rows)(Seq.fill(cols)(randDelta(rnd))))
    }
  }

  test("retraction at a later iteration when a fact's derivation moves earlier") {
    // Outer tick 0: fact 7 first appears at inner step 1.
    // Outer tick 1: fact 7 already appears at inner step 0 — the (t₂=1)
    // occurrence must be retracted at (1,1) and asserted at (1,0).
    val e = ZSet.empty(spark, schema)
    val f7 = zs1("k", 7L -> 1L)
    val opt = new NestedIncrementalDistinct
    opt.newOuterTick()
    val o00 = opt.step(e)
    val o01 = opt.step(f7)
    assert(o00.isEmpty)
    assert(entriesOf(o01) == Set((Seq("7"), 1L)))
    opt.newOuterTick()
    val o10 = opt.step(f7)
    val o11 = opt.step(e)
    assert(entriesOf(o10) == Set((Seq("7"), 1L)))
    assert(entriesOf(o11) == Set((Seq("7"), -1L)))
  }

  test("doubleH evaluates only on the union of the column-delta supports") {
    val c10 = zs1("k", (1L to 20L).map(k => k -> 1L): _*)
    val c00 = c10
    val e1 = zs1("k", 3L -> -1L)
    val e0 = zs1("k", 5L -> 1L)
    val out = NestedIncrementalDistinct.doubleH(c10, c00, e1, e0)
    // key 3: f(0)−f(1) − (f(1)−f(1)) = −1; key 5: f(1)−f(1) − (f(2)−f(1)) = 0.
    assert(entriesOf(out) == Set((Seq("3"), -1L)))
  }

  test("integrating the nested output over both times reconstructs distinct of the total") {
    val rnd = new Random(43)
    val matrix = Seq.fill(3)(Seq.fill(2)(randDelta(rnd)))
    val opt = new NestedIncrementalDistinct
    var outTotal = ZSet.empty(spark, schema)
    var lastRowOut = ZSet.empty(spark, schema)
    var inTotalLastRow = ZSet.empty(spark, schema)
    var inCum = ZSet.empty(spark, schema)
    matrix.foreach { row =>
      opt.newOuterTick()
      var rowOut = ZSet.empty(spark, schema)
      row.foreach { d =>
        rowOut = rowOut.plus(opt.step(d))
        inCum = inCum.plus(d)
      }
      lastRowOut = lastRowOut.plus(rowOut) // ∫ over inner, I over outer
      inTotalLastRow = inCum
    }
    // ↑∫ then I over outer of the output = distinct of the fully-integrated input.
    assert(lastRowOut.zequals(inTotalLastRow.distinctZ))
  }
}
