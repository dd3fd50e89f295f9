package repro.circuit

import scala.util.Random

import org.scalatest.funsuite.AnyFunSuite

/** Proposition 3.2 — the algebra of the incrementalization operator ·^Δ —
  * plus Theorems 3.3 (linear) and 3.4 (bilinear), verified on randomized
  * ℤ-streams (seeded, deterministic). Each law compares two freshly
  * instantiated circuits on the same stream prefix.
  */
class IncrementalLawsSpec extends AnyFunSuite {

  private val Trials = 25
  private val Len = 16

  private def forAllStreams(n: Int)(f: Seq[List[Long]] => Unit): Unit = {
    val rnd = new Random(42)
    for (_ <- 0 until Trials) {
      val ss = Seq.fill(n)(List.fill(Len)(rnd.nextLong(101) - 50))
      f(ss)
    }
  }

  /** A small zoo of causal time-invariant operators to quantify over. */
  private def mkOps: Seq[(String, () => Op[Long, Long])] = Seq(
    ("scale3", () => Op.lift[Long, Long](_ * 3)),                       // linear
    ("delay", () => Op.delay[Long]),                                    // linear
    ("integrate", () => Op.integrate[Long]),                            // linear
    ("differentiate", () => Op.differentiate[Long]),                    // linear
    ("square", () => Op.lift[Long, Long](x => x * x)),                  // non-linear, zpp
    ("delay+scale", () => Op.delay[Long].andThen(Op.lift[Long, Long](_ * -2))))

  private def inc(mk: () => Op[Long, Long]): Op[Long, Long] = Op.incremental(mk())

  test("Prop 3.2 inversion: (I ∘ Q^Δ ∘ D) = Q") {
    forAllStreams(1) { case Seq(s) =>
      for ((name, mk) <- mkOps) {
        val lhs = Op.unIncremental(inc(mk)).run(s)
        val rhs = mk().run(s)
        assert(lhs == rhs, name)
      }
    }
  }

  test("Prop 3.2 invariance: +^Δ = +") {
    forAllStreams(2) { case Seq(a, b) =>
      val direct = a.zip(b).map { case (x, y) => x + y }
      val viaInc = Op.incremental2(Op.lift2[Long, Long, Long](_ + _)).run(a, b)
      assert(viaInc == direct)
    }
  }

  test("Prop 3.2 invariance: (z⁻¹)^Δ = z⁻¹, I^Δ = I, D^Δ = D, (−)^Δ = −") {
    forAllStreams(1) { case Seq(s) =>
      assert(inc(() => Op.delay[Long]).run(s) == Op.delay[Long].run(s))
      assert(inc(() => Op.integrate[Long]).run(s) == Op.integrate[Long].run(s))
      assert(inc(() => Op.differentiate[Long]).run(s) == Op.differentiate[Long].run(s))
      assert(inc(() => Op.neg[Long]).run(s) == Op.neg[Long].run(s))
    }
  }

  test("Prop 3.2 push/pull: Q ∘ I = I ∘ Q^Δ and D ∘ Q = Q^Δ ∘ D") {
    forAllStreams(1) { case Seq(s) =>
      for ((name, mk) <- mkOps) {
        val l1 = Op.integrate[Long].andThen(mk()).run(s)
        val r1 = inc(mk).andThen(Op.integrate[Long]).run(s)
        assert(l1 == r1, s"push $name")
        val l2 = mk().andThen(Op.differentiate[Long]).run(s)
        val r2 = Op.differentiate[Long].andThen(inc(mk)).run(s)
        assert(l2 == r2, s"pull $name")
      }
    }
  }

  test("Prop 3.2 chain rule: (Q1 ∘ Q2)^Δ = Q1^Δ ∘ Q2^Δ") {
    forAllStreams(1) { case Seq(s) =>
      for ((n1, mk1) <- mkOps; (n2, mk2) <- mkOps) {
        val composed = Op.incremental(mk2().andThen(mk1())).run(s)
        val chained = inc(mk2).andThen(inc(mk1)).run(s)
        assert(composed == chained, s"$n1 ∘ $n2")
      }
    }
  }

  test("Prop 3.2 add rule: (Q1 + Q2)^Δ = Q1^Δ + Q2^Δ") {
    forAllStreams(1) { case Seq(s) =>
      for ((n1, mk1) <- mkOps; (n2, mk2) <- mkOps) {
        def sumOp = new Op[Long, Long] {
          private val q1 = mk1(); private val q2 = mk2()
          def step(a: Long): Long = q1.step(a) + q2.step(a)
        }
        val lhs = Op.incremental(sumOp).run(s)
        val (i1, i2) = (inc(mk1), inc(mk2))
        val rhs = s.map(x => i1.step(x) + i2.step(x))
        assert(lhs == rhs, s"$n1 + $n2")
      }
    }
  }

  test("Prop 3.2 cycle rule: (fix α.T(s, z⁻¹(α)))^Δ = fix α.T^Δ(s, z⁻¹(α))") {
    forAllStreams(1) { case Seq(s) =>
      // T(s, α) = 2·s + 3·α — causal, LTI, so the loop is well-defined.
      def t = Op.lift2[Long, Long, Long]((x, fb) => 2 * x + 3 * fb)
      val lhs = Op.incremental(Op.feedback[Long, Long](t)).run(s)
      val rhs = Op.feedback[Long, Long](Op.incremental2(t)).run(s)
      assert(lhs == rhs)
    }
  }

  test("Thm 3.3: every LTI operator satisfies Q^Δ = Q") {
    val linear: Seq[() => Op[Long, Long]] = Seq(
      () => Op.lift[Long, Long](_ * 5),
      () => Op.delay[Long],
      () => Op.integrate[Long],
      () => Op.differentiate[Long],
      () => Op.integrate[Long].andThen(Op.delay[Long]))
    forAllStreams(1) { case Seq(s) =>
      for (mk <- linear) assert(inc(mk).run(s) == mk().run(s))
    }
  }

  test("Thm 3.3 does NOT hold for non-linear operators") {
    val sq = () => Op.lift[Long, Long](x => x * x)
    val s = List(1L, 2L, 3L)
    assert(inc(sq).run(s) != sq().run(s))
  }

  test("Thm 3.4: Δ(a×b) = Δa×Δb + z⁻¹(I(a))×Δb + Δa×z⁻¹(I(b)) for lifted multiplication") {
    forAllStreams(2) { case Seq(a, b) =>
      val brute = Op.incremental2(Op.lift2[Long, Long, Long](_ * _)).run(a, b)
      val efficient = new Op2[Long, Long, Long] {
        private var ia = 0L; private var ib = 0L // z⁻¹(I(·)): before current tick
        def step(da: Long, db: Long): Long = {
          val out = da * db + ia * db + da * ib
          ia += da; ib += db
          out
        }
      }.run(a, b)
      assert(brute == efficient)
    }
  }

  test("bilinearity of lifted multiplication (Def 2.15)") {
    forAllStreams(3) { case Seq(a, b, c) =>
      val f = (x: Long, y: Long) => x * y
      a.zip(b).zip(c).foreach { case ((x, y), z) =>
        assert(f(x + y, z) == f(x, z) + f(y, z))
        assert(f(x, y + z) == f(x, y) + f(x, z))
      }
    }
  }

  test("incrementalization is meaningful on map-valued (Z-set-like) streams too") {
    type M = Map[String, Long]
    val q: M => M = m => m.map { case (k, v) => k -> v * 2 } // linear
    val s: Seq[M] = Seq(Map("a" -> 1L), Map("b" -> 2L, "a" -> -1L), Map("b" -> -2L))
    val brute = Op.incremental(Op.lift(q)).run(s)
    val direct = Op.lift(q).run(s)
    assert(brute == direct)
  }
}
