package repro.whileq

import repro.circuit.Op
import repro.zset.ZSet

/** Relational while-queries (§7.7):
  * {{{
  *   x := i; while (x changes) x := Q(x);
  * }}}
  * More expressive than stratified Datalog — Q is an arbitrary relational
  * query (it need not be monotone). Termination is not guaranteed; when the
  * loop does terminate it returns the reached fixpoint.
  */
object WhileQueries {

  /** Batch evaluation of the while loop. */
  def whileFix(i: ZSet, q: ZSet => ZSet, maxIter: Int = 10000): ZSet = {
    var x = i.compact()
    var iter = 0
    while (true) {
      require(iter < maxIter, s"whileFix: no fixpoint after $maxIter iterations")
      val next = q(x).compact()
      if (next.minus(x).isEmpty) return x
      x = next
      iter += 1
    }
    x
  }

  /** The lifted, incrementalized while-query (Algorithm 4.8 applied to the
    * whole loop, step 4 — the generic D ∘ ↑whileFix ∘ I form). Because Q is
    * arbitrary (possibly non-monotone), the semi-naïve specialization does
    * not apply; this is the paper's always-correct fallback: consume changes
    * of i, produce changes of the fixpoint.
    */
  final class IncrementalWhile(q: ZSet => ZSet, maxIter: Int = 10000)
      extends Op[ZSet, ZSet] {
    private var integral: Option[ZSet] = None
    private var prevOut: Option[ZSet] = None

    def step(di: ZSet): ZSet = {
      val i = integral.map(_.plus(di)).getOrElse(di).compact()
      integral = Some(i)
      val out = whileFix(i, q, maxIter)
      val delta = prevOut match {
        case Some(p) => out.minus(p).consolidate()
        case None    => out
      }
      prevOut = Some(out.compact())
      delta
    }
  }
}
