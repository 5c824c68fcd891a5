package repro.core

import repro.{SparkSpec, TestGraphs, TestUtil}
import Ast._

/** Algorithms 4–5 (`TupleEvalSolve`, full NavL[PC,NOI]) must agree with the
  * point evaluator on every PTO×PTO pair of a micro-graph — including the
  * occurrence-indicator decompositions and the `[n,_]` saturation bound.
  */
class TupleEvalSolverSpec extends SparkSpec {

  lazy val tiny = TestGraphs.tiny(spark)
  lazy val solver = TupleEvalSolver.fromItpg(tiny)
  lazy val ev = new PointEvaluator(tiny.toTpg)

  private def agree(p: Path): Unit = {
    val expected = TestUtil.tuples4(ev.eval(p))
    val objs = Seq(1L, 2L, 10L)
    for (o1 <- objs; t1 <- 0 to 5; o2 <- objs; t2 <- 0 to 5) {
      val got = solver.check(o1, t1, o2, t2, p)
      assert(got == expected.contains((o1, t1, o2, t2)),
             s"${Ast.show(p)} at ($o1,$t1,$o2,$t2): solver=$got")
    }
  }

  test("NavL[PC] fragment agrees (sanity vs Algorithm 3's scope)") {
    Seq[Path](F, B, Nx, Pv, Tst(Exists), Tst(Not(Exists)),
              Concat(Concat(F, Tst(And(IsEdge, Exists))), F),
              Tst(PathCond(Concat(F, Tst(And(IsEdge, Exists)))))).foreach(agree)
  }

  test("exact repetition r[n,n] agrees (even and odd halving)") {
    agree(Repeat(Nx, 2, Some(2)))
    agree(Repeat(Nx, 3, Some(3)))
    agree(Repeat(Nx, 4, Some(4)))
    agree(Repeat(Concat(Nx, Tst(Exists)), 3, Some(3)))
  }

  test("bounded repetition r[0,m] agrees (even and odd halving)") {
    agree(Repeat(Nx, 0, Some(2)))
    agree(Repeat(Nx, 0, Some(3)))
    agree(Repeat(Concat(Nx, Tst(Exists)), 0, Some(4)))
  }

  test("general r[n,m] splits into r[n,n]/r[0,m-n]") {
    agree(Repeat(Nx, 1, Some(3)))
    agree(Repeat(Concat(Union(Nx, Pv), Tst(Exists)), 1, Some(2)))
  }

  test("open-ended r[n,_] saturates at the paper's bound") {
    agree(Repeat(Nx, 1, None))
    agree(Repeat(Concat(Nx, Tst(Exists)), 0, None))
  }

  test("path conditions may contain occurrence indicators (full PC+NOI)") {
    agree(Tst(PathCond(Concat(Repeat(Nx, 0, Some(2)), Tst(And(IsEdge, Exists))))))
    agree(Tst(Not(PathCond(Repeat(Concat(Nx, Tst(Exists)), 2, Some(2))))))
  }

  test("identity at zero repetitions") {
    agree(Repeat(F, 0, Some(0)))
  }

  test("agrees on a second graph (random micro-graph)") {
    val g = TestGraphs.random(spark, 13)
    val s = TupleEvalSolver.fromItpg(g)
    val e = new PointEvaluator(g.toTpg)
    val p = Repeat(Concat(Union(Nx, Concat(F, Tst(Exists))), Tst(Exists)), 0, Some(3))
    val expected = TestUtil.tuples4(e.eval(p))
    val objs = g.objects.select("id").collect().map(_.getLong(0)).toSeq
    for (o1 <- objs; t1 <- 0 to 7; o2 <- objs; t2 <- 0 to 7) {
      assert(s.check(o1, t1, o2, t2, p) == expected.contains((o1, t1, o2, t2)))
    }
  }
}
