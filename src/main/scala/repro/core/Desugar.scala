package repro.core

import Ast._

/** Desugaring from the practical query language (Section IV) into
  * NavL[PC,NOI] (Section V-A), following the paper's own translation
  * examples:
  *
  *   - every practical navigation step enforces existence of the temporal
  *     object it reaches: `NEXT ⇒ N/∃`, `PREV ⇒ P/∃`, `FWD ⇒ F/∃`,
  *     `BWD ⇒ B/∃` ("where all temporal objects must exist, as required in
  *     Section IV");
  *   - `(x:Person {test = 'pos'})` ⇒ `Node ∧ Person ∧ test↦pos ∧ ∃`;
  *   - `:meets` inside a path ⇒ `meets ∧ ∃`;
  *   - `time = 'k'` ⇒ `(<k+1 ∧ ¬<k)`, `time < 'k'` ⇒ `<k`;
  *   - `-[z:meets]->` ⇒ `F/∃ / (Edge ∧ meets ∧ ∃) / F/∃` (z bound in the
  *     middle), `<-[..]-` the same with `B`, `-[..]-` the union of both.
  */
object Desugar {

  /** Translate a practical `{ … }` condition into a NavL test (no ∃ added —
    * that happens where the condition is attached).
    */
  def condToTest(c: Cond): Test = c match {
    case CProp(p, v)  => PropIs(p, v)
    case CTimeEq(k)   => And(Lt(k + 1), Not(Lt(k)))
    case CTimeLt(k)   => Lt(k)
    case CAnd(a, b)   => And(condToTest(a), condToTest(b))
    case COr(a, b)    => Or(condToTest(a), condToTest(b))
    case CNot(x)      => Not(condToTest(x))
  }

  /** NavL test for a node element `(x:Person {…})`. */
  def elementTest(e: Element): Test = {
    val base: Test = IsNode
    val withLabel = e.label.fold(base)(l => And(base, HasLabel(l)))
    val withCond = e.cond.fold(withLabel)(c => And(withLabel, condToTest(c)))
    And(withCond, Exists)
  }

  /** NavL test for the edge in an edge pattern `-[z:meets]->`. */
  def edgeTest(label: Option[String]): Test = {
    val base: Test = IsEdge
    val withLabel = label.fold(base)(l => And(base, HasLabel(l)))
    And(withLabel, Exists)
  }

  /** Rewrite a practical path into NavL[PC,NOI]: insert ∃ after every axis
    * and conjoin ∃ to every embedded test.
    */
  def practicalPath(p: Path): Path = p match {
    case a: Axis         => Concat(a, Tst(Exists))
    case Tst(t)          => Tst(And(t, Exists))
    case Concat(a, b)    => Concat(practicalPath(a), practicalPath(b))
    case Union(a, b)     => Union(practicalPath(a), practicalPath(b))
    case Repeat(q, n, m) => Repeat(practicalPath(q), n, m)
  }

  /** NavL path for a whole (var-free) segment. */
  def segmentPath(s: Segment): Path = s match {
    case PathSeg(p) => practicalPath(p)
    case EdgeSeg(_, label, dir) =>
      val mid = Tst(edgeTest(label))
      val out = Concat(Concat(Concat(F, mid), F), Tst(Exists))
      val in  = Concat(Concat(Concat(B, mid), B), Tst(Exists))
      dir match {
        case Out   => out
        case In    => in
        case Undir => Union(out, in)
      }
  }

  /** The whole MATCH clause as one NavL path (endpoint semantics only):
    * `test_0 / seg_1 / test_1 / … / seg_k / test_k`.
    */
  def matchPath(q: MatchQuery): Path = {
    var acc: Path = Tst(elementTest(q.elements.head))
    q.segments.zip(q.elements.tail).foreach { case (seg, el) =>
      acc = Concat(Concat(acc, segmentPath(seg)), Tst(elementTest(el)))
    }
    acc
  }

  /** True when the practical path uses no temporal navigation — the fragment
    * whose binding tables may stay temporally coalesced (paper Q1–Q5).
    */
  def isStructuralOnly(p: Path): Boolean = p match {
    case Nx | Pv         => false
    case F | B           => true
    case Tst(t)          => testStructuralOnly(t)
    case Concat(a, b)    => isStructuralOnly(a) && isStructuralOnly(b)
    case Union(a, b)     => isStructuralOnly(a) && isStructuralOnly(b)
    case Repeat(q, _, _) => isStructuralOnly(q)
  }

  private def testStructuralOnly(t: Test): Boolean = t match {
    case PathCond(p) => isStructuralOnly(p)
    case And(a, b)   => testStructuralOnly(a) && testStructuralOnly(b)
    case Or(a, b)    => testStructuralOnly(a) && testStructuralOnly(b)
    case Not(x)      => testStructuralOnly(x)
    case _           => true
  }

  def isStructuralOnly(q: MatchQuery): Boolean =
    q.segments.forall {
      case PathSeg(p)       => isStructuralOnly(p)
      case _: EdgeSeg       => true
    }
}
