package repro.whileq

import org.apache.spark.sql.functions._

import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

/** §7.7: relational while-queries — more expressive than stratified Datalog
  * (Q need not be monotone), with the always-correct incremental fallback.
  */
class WhileSpec extends SparkSpec with ZSetFixtures {

  /** Q(x) = distinct(x ∪ successors-mod-16(x)): saturates a residue orbit. */
  private def qOrbit(x: ZSet): ZSet =
    x.plus(x.mapRows("(k * 2) % 16 AS k")).distinctZ

  test("whileFix reaches the least fixpoint containing i") {
    val i = zs1("k", 1L -> 1L)
    val out = WhileQueries.whileFix(i, qOrbit)
    // Orbit of 1 under doubling mod 16: 1, 2, 4, 8, 0.
    assert(entriesOf(out).map(_._1.head).toSet == Set("1", "2", "4", "8", "0"))
  }

  test("whileFix on an already-fixed input returns it unchanged") {
    val i = zs1("k", 0L -> 1L)
    assert(WhileQueries.whileFix(i, qOrbit).zequals(i.distinctZ))
  }

  test("whileFix supports non-monotone bodies (negation inside Q)") {
    // Q(x) = {0,1} ∪ ({2} \ f(x)) where f(x) = {2 | 1 ∈ x}: non-monotone
    // (adding 1 to x removes 2 from Q(x)), yet the loop converges.
    def q(x: ZSet): ZSet = {
      val base = zs1("k", 0L -> 1L, 1L -> 1L)
      val two = zs1("k", 2L -> 1L)
      val blocker = x.filterZ(col("k") === 1).mapRows("CAST(2 AS BIGINT) AS k")
      base.plus(two.minus(blocker.distinctZ).distinctZ).distinctZ
    }
    val out = WhileQueries.whileFix(zs1("k", 5L -> 1L), q)
    assert(entriesOf(out).map(_._1.head).toSet == Set("0", "1"))
  }

  test("IncrementalWhile maintains the fixpoint under input changes") {
    val inc = new WhileQueries.IncrementalWhile(qOrbit)
    val d1 = inc.step(zs1("k", 1L -> 1L))
    assert(entriesOf(d1).map(_._1.head).toSet == Set("1", "2", "4", "8", "0"))
    // Add 3: orbit adds 3, 6, 12.
    val d2 = inc.step(zs1("k", 3L -> 1L))
    assert(entriesOf(d2).map(_._1.head).toSet == Set("3", "6", "12"))
    // Remove 3 again: those facts retract.
    val d3 = inc.step(zs1("k", 3L -> -1L))
    assert(entriesOf(d3) == Set((Seq("3"), -1L), (Seq("6"), -1L), (Seq("12"), -1L)))
  }

  test("IncrementalWhile: redundant change produces no view delta") {
    val inc = new WhileQueries.IncrementalWhile(qOrbit)
    inc.step(zs1("k", 1L -> 1L))
    val d = inc.step(zs1("k", 2L -> 1L)) // 2 is already in the orbit of 1
    assert(d.isEmpty)
  }
}
