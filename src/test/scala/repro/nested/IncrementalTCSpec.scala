package repro.nested

import repro.recursive.TransitiveClosure
import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

/** §6.1 end to end: the incrementally-maintained transitive closure must
  * track `TC(I(ΔE))` delta for delta, through insertions and deletions —
  * the paper's "incremental recursive query".
  */
class IncrementalTCSpec extends SparkSpec with ZSetFixtures {

  private def edges(pairs: (Long, Long)*): ZSet =
    zs2("h", "t", pairs.map(p => p -> 1L): _*)

  /** Drive the incremental circuit over a change stream; at every tick check
    * the integrated view equals a from-scratch semi-naïve recomputation.
    */
  private def check(deltas: Seq[ZSet]): Unit = {
    val itc = new IncrementalTransitiveClosure(spark)
    var eAcc = TransitiveClosure.emptyE(spark)
    var rAcc = TransitiveClosure.emptyR(spark)
    deltas.zipWithIndex.foreach { case (dE, t) =>
      val (dR, _) = itc.step(dE)
      eAcc = eAcc.plus(dE).compact()
      rAcc = rAcc.plus(dR).compact()
      val (expected, _) = TransitiveClosure.semiNaive(eAcc)
      assert(rAcc.zequals(expected),
        s"tick $t: maintained TC diverges; got=${rAcc.entries()} want=${expected.entries()}")
    }
  }

  test("pure insertions extending a path") {
    check(Seq(
      edges(1L -> 2L),
      edges(2L -> 3L),
      edges(3L -> 4L)))
  }

  test("insertion creating a shortcut (derivation-depth change ⇒ inner retractions)") {
    check(Seq(
      edges(1L -> 2L, 2L -> 3L, 3L -> 4L),
      edges(1L -> 4L),   // already derivable — view delta must be ~empty
      edges(1L -> 3L)))  // shortcut: shortens derivations, no new facts
  }

  test("deletion removes reachability facts") {
    check(Seq(
      edges(1L -> 2L, 2L -> 3L),
      edges(2L -> 3L).negate, // cut the path
      edges(2L -> 4L)))
  }

  test("deletion of a redundant edge keeps facts derivable another way") {
    check(Seq(
      edges(1L -> 2L, 2L -> 3L, 1L -> 3L),
      edges(1L -> 3L).negate)) // (1,3) still derivable via 2
  }

  test("cycle creation and destruction") {
    check(Seq(
      edges(1L -> 2L, 2L -> 3L),
      edges(3L -> 1L),          // close the cycle: everything reaches everything
      edges(3L -> 1L).negate))  // reopen it
  }

  test("empty transaction produces an empty view delta") {
    val itc = new IncrementalTransitiveClosure(spark)
    val (d1, _) = itc.step(edges(1L -> 2L))
    assert(d1.nonEmpty)
    val (d2, _) = itc.step(TransitiveClosure.emptyE(spark))
    assert(d2.isEmpty)
  }

  test("redundant insertion yields an empty view delta (but internal adjustments)") {
    val itc = new IncrementalTransitiveClosure(spark)
    itc.step(edges(1L -> 2L, 2L -> 3L))
    val (d, _) = itc.step(edges(1L -> 3L).plus(edges(1L -> 3L))) // weight-2 insert of a derivable fact...
    // (1,3) is already in the closure; R is a set, so the view must not change.
    assert(d.isEmpty)
  }
}
