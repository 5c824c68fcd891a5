package repro.core

import scala.collection.mutable

import repro.tpg.Itpg
import Ast._

/** Algorithms 4–5 of the paper (`TupleEvalSolve`): membership
  * `(o1,t1,o2,t2) ∈ [[r]]_C` for the *full* language NavL[PC,NOI] over a
  * driver-local ITPG.
  *
  * Numerical occurrence indicators are decomposed exactly as in Algorithm 5:
  * `r[n,n]` by exponent halving, `r[0,m]` by `r[0,⌊m/2⌋]` (plus an `r[0,1]`
  * middle for odd m), `r[n,m]` as `r[n,n]/r[0,m−n]`, and `r[n,_]` as
  * `r[n, n + (|Ω|·|N∪E|)²]` (the paper's saturation bound).
  *
  * Deviation, documented: the paper's algorithm re-derives every recursive
  * call to stay within polynomial *space* (that is the point of the PSPACE
  * upper bound); re-derivation makes it exponential-*time*, which is
  * untestable even on micro-graphs. We memoize sub-results — the same trade
  * the paper itself makes in Algorithm 3 for NavL[PC] — which changes
  * nothing about the answers.
  */
final class TupleEvalSolver(omegaLo: Int, omegaHi: Int, objects: Map[Long, LocalObject]) {

  private val memo = mutable.HashMap.empty[(Long, Int, Long, Int, Path), Boolean]
  private val objIds: Seq[Long] = objects.keys.toSeq.sorted
  private val saturation: Int = {
    val m = (omegaHi - omegaLo + 1) * objects.size
    m * m
  }

  private def existsAt(o: LocalObject, t: Int): Boolean =
    o.exist.exists { case (a, b) => a <= t && t <= b }

  private def propAt(o: LocalObject, p: String, t: Int): Option[String] =
    o.props.getOrElse(p, Nil).collectFirst { case (v, a, b) if a <= t && t <= b => v }

  def checkTest(oid: Long, t: Int, test: Test): Boolean = {
    val o = objects(oid)
    test match {
      case IsNode       => o.isNode
      case IsEdge       => !o.isNode
      case HasLabel(l)  => o.label == l
      case PropIs(p, v) => propAt(o, p, t).contains(v)
      case Lt(k)        => t < k
      case Exists       => existsAt(o, t)
      case And(a, b)    => checkTest(oid, t, a) && checkTest(oid, t, b)
      case Or(a, b)     => checkTest(oid, t, a) || checkTest(oid, t, b)
      case Not(x)       => !checkTest(oid, t, x)
      case PathCond(p) =>
        objIds.exists(o2 => (omegaLo to omegaHi).exists(t2 => check(oid, t, o2, t2, p)))
    }
  }

  private def anyMid(f: (Long, Int) => Boolean): Boolean =
    objIds.exists(o => (omegaLo to omegaHi).exists(t => f(o, t)))

  def check(o1: Long, t1: Int, o2: Long, t2: Int, r: Path): Boolean = {
    val key = (o1, t1, o2, t2, r)
    memo.getOrElseUpdate(key, {
      val a = objects(o1)
      r match {
        case Nx => o1 == o2 && t2 == t1 + 1
        case Pv => o1 == o2 && t2 == t1 - 1
        case F =>
          t1 == t2 && ((!a.isNode && a.dst == o2) || (!objects(o2).isNode && objects(o2).src == o1))
        case B =>
          t1 == t2 && ((!a.isNode && a.src == o2) || (!objects(o2).isNode && objects(o2).dst == o1))
        case Tst(t) => o1 == o2 && t1 == t2 && checkTest(o1, t1, t)
        case Union(r1, r2) =>
          check(o1, t1, o2, t2, r1) || check(o1, t1, o2, t2, r2)
        case Concat(r1, r2) =>
          anyMid((o, t) => check(o1, t1, o, t, r1) && check(o, t, o2, t2, r2))
        case Repeat(r1, n, Some(m)) if m == n =>
          if (n == 0) o1 == o2 && t1 == t2
          else if (n == 1) check(o1, t1, o2, t2, r1)
          else {
            val l = n / 2
            if (n % 2 == 0)
              anyMid((o, t) => check(o1, t1, o, t, Repeat(r1, l, Some(l))) &&
                               check(o, t, o2, t2, Repeat(r1, l, Some(l))))
            else
              anyMid((o, t) => check(o1, t1, o, t, Repeat(r1, l, Some(l))) &&
                anyMid((o3, t3) => check(o, t, o3, t3, r1) &&
                                   check(o3, t3, o2, t2, Repeat(r1, l, Some(l)))))
          }
        case Repeat(r1, 0, Some(m)) =>
          if (m == 1) (o1 == o2 && t1 == t2) || check(o1, t1, o2, t2, r1)
          else {
            val l = m / 2
            if (m % 2 == 0)
              anyMid((o, t) => check(o1, t1, o, t, Repeat(r1, 0, Some(l))) &&
                               check(o, t, o2, t2, Repeat(r1, 0, Some(l))))
            else
              anyMid((o, t) => check(o1, t1, o, t, Repeat(r1, 0, Some(l))) &&
                anyMid((o3, t3) => check(o, t, o3, t3, Repeat(r1, 0, Some(1))) &&
                                   check(o3, t3, o2, t2, Repeat(r1, 0, Some(l)))))
          }
        case Repeat(r1, n, Some(m)) => // 0 < n < m
          anyMid((o, t) => check(o1, t1, o, t, Repeat(r1, n, Some(n))) &&
                           check(o, t, o2, t2, Repeat(r1, 0, Some(m - n))))
        case Repeat(r1, n, None) =>
          check(o1, t1, o2, t2, Repeat(r1, n, Some(n + saturation)))
      }
    })
  }
}

object TupleEvalSolver {
  /** Collect an [[Itpg]] to the driver (micro-graphs only). */
  def fromItpg(g: Itpg): TupleEvalSolver =
    new TupleEvalSolver(g.omegaLo, g.omegaHi, PairChecker.collectObjects(g))
}
