package repro.core

import repro.{SparkSpec, TestGraphs, TestUtil}
import repro.tpg.FigureOne
import Ast._

/** Interval-side specifics: test-interval computation stays coalesced and
  * interval-reasoned (no point expansion), Kleene stars converge, and the
  * paper's Q8 formal translation produces the exact expected rooms.
  */
class IntervalEvaluatorSpec extends SparkSpec {

  lazy val fig = FigureOne.itpg(spark)
  lazy val ev = new IntervalEvaluator(fig)
  lazy val tiny = TestGraphs.tiny(spark)
  lazy val tinyEv = new IntervalEvaluator(tiny)

  test("testIv(∃) returns the coalesced existence intervals") {
    assert(TestUtil.ivs(ev.testIv(Exists).filter("id = 2")) == Set((2L, 1, 9)))
    assert(TestUtil.ivs(tinyEv.testIv(Exists).filter("id = 1")) == Set((1L, 0, 2), (1L, 4, 5)))
  }

  test("testIv(p↦v) returns coalesced valued intervals") {
    assert(TestUtil.ivs(ev.testIv(PropIs("risk", "high"))) ==
           Set((2L, 5, 9), (3L, 1, 7), (7L, 5, 8)))
  }

  test("testIv(¬∃) complements per object over Ω") {
    assert(TestUtil.ivs(tinyEv.testIv(Not(Exists))) ==
           Set((1L, 3, 3), (10L, 0, 0), (10L, 3, 5)))
  }

  test("testIv(<k) clips to the domain") {
    val got = TestUtil.ivs(tinyEv.testIv(Lt(3)))
    assert(got == Set((1L, 0, 2), (2L, 0, 2), (10L, 0, 2)))
    assert(tinyEv.testIv(Lt(0)).count() == 0)
    // k beyond the domain covers everything
    assert(TestUtil.ivs(tinyEv.testIv(Lt(100))) == Set((1L, 0, 5), (2L, 0, 5), (10L, 0, 5)))
  }

  test("testIv(∧) intersects; testIv(∨) unions and coalesces") {
    assert(TestUtil.ivs(tinyEv.testIv(And(Exists, Lt(2))).filter("id = 1")) == Set((1L, 0, 1)))
    assert(TestUtil.ivs(tinyEv.testIv(Or(Exists, Not(Exists))).filter("id = 1")) == Set((1L, 0, 5)))
  }

  test("testIv(?path) projects feasible starts") {
    // nodes with a live outgoing edge: only a during [1,2]
    val got = TestUtil.ivs(tinyEv.testIv(PathCond(Concat(F, Tst(And(IsEdge, Exists))))))
    assert(got == Set((1L, 1, 2)))
  }

  test("axis bands stay un-expanded: F over Figure 1 has 2 bands per edge") {
    assert(ev.evalBands(F).count() == 20)
  }

  test("(N/∃)[0,_] over Figure 1 stays band-compact (far fewer rows than points)") {
    val bands = ev.evalBands(Repeat(Concat(Nx, Tst(Exists)), 0, None)).count()
    val points = ev.evalPoints(Repeat(Concat(Nx, Tst(Exists)), 0, None)).count()
    assert(bands < points)
  }

  test("Q8 formal translation over Figure 1: the four person-room rows") {
    val p = Concat(Concat(Concat(Concat(
      Tst(And(And(IsNode, HasLabel("Person")), PropIs("test", "pos"))),
      Repeat(Concat(Pv, Tst(Exists)), 0, None)), F), Tst(And(HasLabel("visits"), Exists))), F)
    val got = TestUtil.tuples4(ev.evalPoints(p))
    assert(got == Set((6L, 9, 4L, 8), (6L, 9, 4L, 7), (6L, 9, 5L, 6), (6L, 9, 5L, 5)))
  }

  test("Q12 formal translation (Section V-A) over Figure 1") {
    // (Node ∧ Person ∧ risk↦high)/(F/(meets ∧ ∃)/F + F/(visits ∧ ∃)/F/Room/B/(visits ∧ ∃)/B)/
    // (N/∃)[0,12]/(Node ∧ test↦pos)
    val meets = Concat(Concat(F, Tst(And(HasLabel("meets"), Exists))), F)
    val visits = Concat(Concat(Concat(Concat(Concat(
      F, Tst(And(HasLabel("visits"), Exists))), F), Tst(HasLabel("Room"))), B),
      Concat(Tst(And(HasLabel("visits"), Exists)), B))
    val p = Concat(Concat(Concat(
      Tst(And(And(IsNode, HasLabel("Person")), PropIs("risk", "high"))),
      Union(meets, visits)),
      Repeat(Concat(Nx, Tst(Exists)), 0, Some(12))),
      Tst(And(IsNode, PropIs("test", "pos"))))
    val got = TestUtil.tuples4(ev.evalPoints(p)).map { case (o1, t1, _, _) =>
      (FigureOne.names(o1), t1)
    }
    assert(got == Set(("n3", 4), ("n3", 7), ("n7", 5), ("n7", 6), ("n7", 7), ("n7", 8)))
  }

  test("memoized subtrees return the same DataFrame") {
    val p = Repeat(Concat(Nx, Tst(Exists)), 0, None)
    assert(ev.evalBands(p) eq ev.evalBands(p))
  }

  test("single-point domain: N and P are empty") {
    val g1 = repro.tpg.FigureOne.build(spark, 3, 3,
      Seq(repro.tpg.NodeRow(1, "A", Map.empty, 3, 3)), Seq.empty)
    val e = new IntervalEvaluator(g1)
    assert(e.evalBands(Nx).count() == 0 && e.evalBands(Pv).count() == 0)
    assert(TestUtil.tuples4(e.evalPoints(Tst(Exists))) == Set((1L, 3, 1L, 3)))
  }
}
