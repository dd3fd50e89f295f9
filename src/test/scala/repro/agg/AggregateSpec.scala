package repro.agg

import scala.util.Random

import repro.harness.Changes
import repro.zset.ZSet
import repro.{Oracle, SparkSpec, SynthData, ZSetFixtures}

/** §7.2–7.4: aggregation on Z-sets. Linear aggregates (COUNT/SUM/AVG) are
  * incremental "for free"; MIN falls back to brute force over the stored
  * integral; GROUP BY-AGGREGATE re-evaluates only changed groupings.
  */
class AggregateSpec extends SparkSpec with ZSetFixtures {

  private def kv(entries: ((Long, Long), Long)*): ZSet = zs2("k", "v", entries: _*)

  /** Drive an incremental aggregate over a change stream; at each tick the
    * integrated output view must equal the batch aggregate of the integrated
    * input.
    */
  private def checkIncremental(f: AggFunc, deltas: Seq[ZSet], keys: Seq[String] = Seq("k")): Unit = {
    val inc = new IncrementalGroupAggregate(keys, f)
    var inAcc: Option[ZSet] = None
    var outAcc: Option[ZSet] = None
    deltas.zipWithIndex.foreach { case (d, t) =>
      val o = inc.step(d)
      inAcc = Some(inAcc.map(_.plus(d).compact()).getOrElse(d))
      outAcc = Some(outAcc.map(_.plus(o).compact()).getOrElse(o))
      val expected = GroupAggregate.batch(inAcc.get, keys, f)
      assert(outAcc.get.zequals(expected), s"tick $t (${f.getClass.getSimpleName})")
    }
  }

  // ------------------------------------------------------------------ batch

  test("a_COUNT is the weighted count (paper: sum of multiplicities)") {
    val z = kv((1L, 10L) -> 2L, (1L, 20L) -> 1L, (2L, 5L) -> 3L)
    val out = GroupAggregate.batch(z, Seq("k"), AggFunc.Count())
    assert(entriesOf(out) == Set((Seq("1", "3"), 1L), (Seq("2", "3"), 1L)))
  }

  test("a_SUM is the weighted sum") {
    val z = kv((1L, 10L) -> 2L, (1L, 20L) -> 1L)
    val out = GroupAggregate.batch(z, Seq("k"), AggFunc.Sum("v"))
    assert(entriesOf(out) == Set((Seq("1", "40.000000"), 1L)))
  }

  test("batch GROUP BY COUNT ≡ DuckDB") {
    val z = ZSet.fromSet(SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_orderkey"))
    val out = GroupAggregate.batch(z, Seq("l_returnflag"), AggFunc.Count())
    Oracle.assertEquivalent(out.toSetDF,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM li GROUP BY l_returnflag",
      "li" -> z.toSetDF)
  }

  test("batch GROUP BY SUM ≡ DuckDB") {
    val z = ZSet.fromSet(
      SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_orderkey", "l_quantity"))
    val out = GroupAggregate.batch(z, Seq("l_returnflag"), AggFunc.Sum("l_quantity"))
    Oracle.assertEquivalent(out.toSetDF,
      """SELECT l_returnflag, SUM(CAST(l_quantity AS DOUBLE)) AS total
        |FROM li GROUP BY l_returnflag""".stripMargin,
      "li" -> z.toSetDF)
  }

  test("batch GROUP BY MIN ≡ DuckDB") {
    val z = ZSet.fromSet(
      SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_orderkey", "l_partkey"))
    val out = GroupAggregate.batch(z, Seq("l_returnflag"), AggFunc.Min("l_partkey"))
    Oracle.assertEquivalent(out.toSetDF,
      "SELECT l_returnflag, MIN(CAST(l_partkey AS BIGINT)) AS mn FROM li GROUP BY l_returnflag",
      "li" -> z.toSetDF)
  }

  // ------------------------------------------------------------ incremental

  test("incremental COUNT per group (linear ⇒ exact)") {
    checkIncremental(AggFunc.Count(), Seq(
      kv((1L, 10L) -> 1L, (2L, 5L) -> 1L),
      kv((1L, 20L) -> 1L),
      kv((1L, 10L) -> -1L),
      kv((2L, 5L) -> -1L))) // group 2 vanishes
  }

  test("incremental SUM per group with deletions") {
    checkIncremental(AggFunc.Sum("v"), Seq(
      kv((1L, 10L) -> 1L, (1L, 20L) -> 1L),
      kv((1L, 10L) -> -1L, (2L, 7L) -> 2L),
      kv((2L, 7L) -> -2L)))
  }

  test("incremental AVG per group (SUM/COUNT pair + division at output)") {
    checkIncremental(AggFunc.Avg("v"), Seq(
      kv((1L, 10L) -> 1L, (1L, 30L) -> 1L),
      kv((1L, 20L) -> 1L),
      kv((1L, 30L) -> -1L)))
  }

  test("incremental MIN per group: deletion of the minimum (needs the full set — brute force)") {
    checkIncremental(AggFunc.Min("v"), Seq(
      kv((1L, 10L) -> 1L, (1L, 20L) -> 1L),
      kv((1L, 5L) -> 1L),
      kv((1L, 5L) -> -1L),   // min returns to 10
      kv((1L, 10L) -> -1L))) // min becomes 20
  }

  test("incremental aggregates on a randomized change stream (all four functions)") {
    val rnd = new Random(51)
    val base = kv((0 until 30).map { i =>
      (rnd.nextInt(4).toLong, rnd.nextInt(50).toLong + 1) -> 1L
    }.distinct: _*)
    val deltas = Changes.stream(base, ticks = 4, initialFrac = 0.5, deleteFrac = 0.3, seed = 5)
    checkIncremental(AggFunc.Count(), deltas)
    checkIncremental(AggFunc.Sum("v"), deltas)
    checkIncremental(AggFunc.Min("v"), deltas)
  }

  test("untouched groups emit no output (§7.4: only changed groupings re-evaluated)") {
    val inc = new IncrementalGroupAggregate(Seq("k"), AggFunc.Count())
    inc.step(kv((1L, 1L) -> 1L, (2L, 1L) -> 1L, (3L, 1L) -> 1L))
    val out = inc.step(kv((2L, 9L) -> 1L))
    // Only group 2 appears (retract cnt=1, assert cnt=2).
    assert(entriesOf(out) == Set((Seq("2", "1"), -1L), (Seq("2", "2"), 1L)))
  }

  // ------------------------------------------------------- global (scalar)

  test("global SUM via makeset (§7.2 circuit): retract/assert singleton") {
    val inc = new IncrementalScalarAggregate(AggFunc.Sum("v", "s"))
    val o1 = inc.step(kv((1L, 10L) -> 1L, (2L, 5L) -> 2L).project("v").mapRows("v"))
    assert(entriesOf(o1) == Set((Seq("20.000000"), 1L)))
    val o2 = inc.step(kv((3L, 7L) -> 1L).project("v").mapRows("v"))
    assert(entriesOf(o2) == Set((Seq("20.000000"), -1L), (Seq("27.000000"), 1L)))
  }

  test("global COUNT tracks insertions and deletions") {
    val inc = new IncrementalScalarAggregate(AggFunc.Count("c"))
    val o1 = inc.step(zs1("v", 10L -> 2L, 20L -> 1L))
    assert(entriesOf(o1) == Set((Seq("3"), 1L)))
    val o2 = inc.step(zs1("v", 10L -> -1L))
    assert(entriesOf(o2) == Set((Seq("3"), -1L), (Seq("2"), 1L)))
  }

  test("global MIN is brute force but correct under deletions") {
    val inc = new IncrementalScalarAggregate(AggFunc.Min("v", "m"))
    inc.step(zs1("v", 10L -> 1L, 20L -> 1L))
    val o2 = inc.step(zs1("v", 5L -> 1L))
    assert(entriesOf(o2) == Set((Seq("10"), -1L), (Seq("5"), 1L)))
    val o3 = inc.step(zs1("v", 5L -> -1L))
    assert(entriesOf(o3) == Set((Seq("5"), -1L), (Seq("10"), 1L)))
  }

  test("global AVG = SUM/COUNT (§7.2's composed circuit)") {
    val inc = new IncrementalScalarAggregate(AggFunc.Avg("v", "a"))
    val o1 = inc.step(zs1("v", 10L -> 1L, 20L -> 1L))
    assert(entriesOf(o1) == Set((Seq("15.000000"), 1L)))
    val o2 = inc.step(zs1("v", 30L -> 1L))
    assert(entriesOf(o2) == Set((Seq("15.000000"), -1L), (Seq("20.000000"), 1L)))
  }
}
