package repro.relational

import scala.util.Random

import repro.zset.ZSet
import repro.{SparkSpec, ZSetFixtures}

import ZExpr._

/** Distinct consolidation (Algorithm 4.8 step 2 / Props 4.5–4.6): rewrites
  * reduce the number of distinct operators, never fire across negation, and
  * preserve circuit semantics on randomized positive inputs.
  */
class OptimizerSpec extends SparkSpec with ZSetFixtures {

  private def t(n: String) = ZInput(n)

  test("distinct ∘ distinct collapses") {
    val e = ZDistinct(ZDistinct(t("a")))
    assert(DistinctOptimizer.optimize(e) == ZDistinct(t("a")))
  }

  test("Prop 4.6: absorb through σ") {
    val e = ZDistinct(ZFilter(ZDistinct(t("a")), "x > 1"))
    assert(DistinctOptimizer.optimize(e) == ZDistinct(ZFilter(t("a"), "x > 1")))
  }

  test("Prop 4.6: absorb through π and +") {
    val e = ZDistinct(ZSum(ZMap(ZDistinct(t("a")), Seq("x")), ZDistinct(t("b"))))
    assert(DistinctOptimizer.optimize(e) ==
      ZDistinct(ZSum(ZMap(t("a"), Seq("x")), t("b"))))
  }

  test("Prop 4.5: distinct below a join is hoisted (then absorbable)") {
    val e = ZJoin(ZDistinct(t("a")), t("b"), Seq("k"))
    assert(DistinctOptimizer.optimize(e) == ZDistinct(ZJoin(t("a"), t("b"), Seq("k"))))
  }

  test("no rewrite across negation (EXCEPT stays intact)") {
    val e = ZDistinct(ZSum(ZDistinct(ZMap(t("a"), Seq("x"))), ZNeg(t("b"))))
    val opt = DistinctOptimizer.optimize(e)
    // The inner distinct guards the minuend's multiplicities; it must remain.
    assert(opt.distinctCount == e.distinctCount)
  }

  test("§4.4 pipeline: four distincts consolidate into one") {
    // t1 → σ → distinct → π → ⨝ → π → distinct, t2 → σ → distinct → π —
    // the paper's step-1 circuit (distinct after every set-producing stage).
    val left = ZMap(ZDistinct(ZFilter(t("t1"), "a > 2")), Seq("x", "id"))
    val right = ZMap(ZDistinct(ZFilter(t("t2"), "s > 5")), Seq("y", "id"))
    val e = ZDistinct(ZMap(ZDistinct(ZJoin(left, right, Seq("id"))), Seq("x", "y")))
    assert(e.distinctCount == 4)
    val opt = DistinctOptimizer.optimize(e)
    assert(opt.distinctCount == 1, s"got $opt")
  }

  test("Table 1 translation of a 3-way union has its distincts consolidated") {
    import Rel._
    val q = Union(Union(Table("a"), Table("b")), Project(Table("c"), Seq("x", "y")))
    val raw = Table1.translate(q)
    val opt = DistinctOptimizer.optimize(raw)
    assert(opt.distinctCount == 1)
    assert(raw.distinctCount > 1)
  }

  test("optimized circuits are semantically equivalent on random positive inputs") {
    val rnd = new Random(31)
    val circuits = Seq(
      ZDistinct(ZFilter(ZDistinct(t("a")), "x % 2 = 0")),
      ZDistinct(ZSum(ZDistinct(t("a")), ZDistinct(t("b")))),
      ZDistinct(ZMap(ZDistinct(ZSum(t("a"), t("b"))), Seq("x + 1 AS x1"))),
      ZJoin(ZDistinct(t("a2")), ZDistinct(t("b2")), Seq("x")),
      ZDistinct(ZSum(ZDistinct(ZMap(t("a"), Seq("x"))), ZNeg(ZDistinct(t("b"))))))
    def rand1(): ZSet = zs1("x",
      (0 until 4).map(_ => rnd.nextInt(5).toLong -> (1L + rnd.nextInt(3))): _*)
    def rand2(v: String): ZSet = zs2("x", v,
      (0 until 4).map(_ => (rnd.nextInt(3).toLong, rnd.nextInt(3).toLong) -> (1L + rnd.nextInt(2))): _*)
    for (trial <- 0 until 3; c <- circuits) {
      val inputs = Map(
        "a" -> rand1(), "b" -> rand1(), "a2" -> rand2("u"), "b2" -> rand2("v"))
      val orig = BatchEval.eval(c, inputs)
      val opt = BatchEval.eval(DistinctOptimizer.optimize(c), inputs)
      assert(orig.zequals(opt), s"trial $trial circuit $c")
    }
  }
}
