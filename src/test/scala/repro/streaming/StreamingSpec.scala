package repro.streaming

import scala.util.Random

import repro.algebra.Group
import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

/** §7.6: streaming joins and window queries. */
class StreamingSpec extends SparkSpec with ZSetFixtures {

  // ------------------------------------------------------ relation-to-stream

  test("stream join matches telemetry against the accumulated relation") {
    val j = new StreamRelationJoin(Seq("k"))
    val o1 = j.step(zs2("k", "name", (1L, 100L) -> 1L), zs2("k", "ev", (1L, 7L) -> 1L, (2L, 8L) -> 1L))
    assert(entriesOf(o1) == Set((Seq("1", "100", "7"), 1L)))
    // Relation grows; earlier telemetry is NOT re-emitted (t is discarded).
    val o2 = j.step(zs2("k", "name", (2L, 200L) -> 1L), zs2("k", "ev", (2L, 9L) -> 1L))
    assert(entriesOf(o2) == Set((Seq("2", "200", "9"), 1L)))
  }

  test("stream join respects relation deletions") {
    val j = new StreamRelationJoin(Seq("k"))
    j.step(zs2("k", "name", (1L, 100L) -> 1L), zs2("k", "ev", (9L, 9L) -> 1L))
    val out = j.step(zs2("k", "name", (1L, 100L) -> -1L), zs2("k", "ev", (1L, 7L) -> 1L))
    assert(out.isEmpty)
  }

  test("stream join ≡ I(s) ⋈ t at every tick (randomized)") {
    val rnd = new Random(61)
    val j = new StreamRelationJoin(Seq("k"))
    var acc: Option[ZSet] = None
    for (_ <- 0 until 4) {
      val ds = zs2("k", "name",
        Seq.fill(2)(((rnd.nextInt(3).toLong, rnd.nextInt(5).toLong), rnd.nextInt(3) - 1L))
          .filter(_._2 != 0L): _*)
      val batch = zs2("k", "ev",
        Seq.fill(2)(((rnd.nextInt(3).toLong, rnd.nextInt(5).toLong), 1L)): _*)
      val out = j.step(ds, batch)
      acc = Some(acc.map(_.plus(ds)).getOrElse(ds))
      assert(out.zequals(acc.get.join(batch, Seq("k"))))
    }
  }

  // ----------------------------------------------------------------- windows

  test("window ≡ brute force W(I(v)) under monotone θ") {
    val w = new WindowIntegrate("ts", width = 10.0)
    var integral: Option[ZSet] = None
    val ticksData = Seq(
      (zs2("ts", "v", (1L, 100L) -> 1L, (3L, 101L) -> 1L), 5.0),
      (zs2("ts", "v", (8L, 102L) -> 1L), 12.0),
      (zs2("ts", "v", (15L, 103L) -> 1L, (14L, 104L) -> 1L), 20.0),
      (zs2("ts", "v", (25L, 105L) -> 1L), 30.0))
    for ((d, theta) <- ticksData) {
      val windowed = w.step(d, theta)
      integral = Some(integral.map(_.plus(d)).getOrElse(d))
      val brute = WindowIntegrate.bruteForce(integral.get, "ts", 10.0, theta)
      assert(windowed.zequals(brute), s"θ=$theta")
    }
  }

  test("window state is bounded: evicted rows leave the state") {
    val w = new WindowIntegrate("ts", width = 10.0)
    w.step(zs2("ts", "v", (1L, 1L) -> 1L, (2L, 2L) -> 1L), 5.0)
    assert(w.stateSize == 2)
    w.step(zs2("ts", "v", (50L, 3L) -> 1L), 55.0)
    assert(w.stateSize == 1) // rows at ts 1, 2 evicted; only ts 50 retained
  }

  test("window handles deletions of in-window rows") {
    val w = new WindowIntegrate("ts", width = 10.0)
    w.step(zs2("ts", "v", (4L, 1L) -> 1L, (5L, 2L) -> 1L), 5.0)
    val out = w.step(zs2("ts", "v", (5L, 2L) -> -1L), 6.0)
    assert(entriesOf(out) == Set((Seq("4", "1"), 1L)))
  }

  test("fixed-size sliding-window aggregate (4-tap convolution) on ℤ streams") {
    val conv = new Convolution[Long](4)
    val in = Seq(1L, 2L, 3L, 4L, 5L, 6L)
    val out = in.map(conv.step)
    assert(out == Seq(1L, 3L, 6L, 10L, 14L, 18L))
  }

  test("4-tap convolution on Z-set streams sums the last four ticks") {
    implicit val g: Group[ZSet] = ZSet.group(spark,
      org.apache.spark.sql.types.StructType(Seq(
        org.apache.spark.sql.types.StructField("k", org.apache.spark.sql.types.LongType, nullable = false))))
    val conv = new Convolution[ZSet](4)
    val ticks = (1L to 5L).map(i => zs1("k", i -> 1L))
    val outs = ticks.map(conv.step)
    assert(outs(3).entryCount == 4) // ticks 1..4
    assert(outs(4).entryCount == 4) // ticks 2..5 — tick 1 aged out
    assert(entriesOf(outs(4)).map(_._1.head).toSet == Set("2", "3", "4", "5"))
  }
}
