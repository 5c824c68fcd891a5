package repro.core

import repro.{SparkSpec, TestUtil}
import repro.tpg.{FigureOne, Itpg}

/** The paper's example binding tables, verbatim: every query of Section IV
  * (and the intro query) evaluated over the Figure-1 TPG must produce
  * exactly the rows the paper prints.
  */
class FigureOneQueriesSpec extends SparkSpec {

  lazy val g: Itpg = FigureOne.itpg(spark)
  lazy val ev = new IntervalEvaluator(g)

  private def run(q: String) = MatchEvaluator.bindingsPoints(ev, Parser.parseMatch(q))

  test("Q1: all persons — one row per existence point") {
    val got = TestUtil.named2(run(PaperQueries.q1), "x", "x_time")
    val expected =
      (1 to 9).map(t => ("n1", t)) ++ (1 to 9).map(t => ("n2", t)) ++
      (1 to 7).map(t => ("n3", t)) ++ (2 to 9).map(t => ("n6", t)) ++
      (5 to 8).map(t => ("n7", t))
    assert(got == expected.toSet)
    // the fragments the paper prints
    assert(Set(("n1", 1), ("n1", 9), ("n2", 1), ("n7", 8)).subsetOf(got))
  }

  test("Q2: low-risk persons") {
    val got = TestUtil.named2(run(PaperQueries.q2), "x", "x_time")
    val expected =
      (1 to 9).map(t => ("n1", t)) ++ (1 to 4).map(t => ("n2", t)) ++ (2 to 9).map(t => ("n6", t))
    assert(got == expected.toSet)
    assert(Set(("n1", 1), ("n2", 1), ("n6", 2)).subsetOf(got)) // shown fragments
  }

  test("Q3: low risk at time 1 — exactly the paper's table") {
    assert(TestUtil.named2(run(PaperQueries.q3), "x", "x_time") == Set(("n1", 1), ("n2", 1)))
  }

  test("Q4: low risk before time 10 — same as Q2 on this graph") {
    assert(TestUtil.named2(run(PaperQueries.q4), "x", "x_time") ==
           TestUtil.named2(run(PaperQueries.q2), "x", "x_time"))
  }

  test("Q5: low-risk meets high-risk — exactly the paper's four rows") {
    val got = TestUtil.named6(run(PaperQueries.q5), Seq("x", "x_time", "z", "z_time", "y", "y_time"))
    assert(got == Set(
      ("n1", 5, "e1", 5, "n2", 5),
      ("n1", 6, "e1", 6, "n2", 6),
      ("n2", 1, "e2", 1, "n3", 1),
      ("n2", 2, "e2", 2, "n3", 2)))
  }

  test("Q5 coalesced: the paper's interval-coalesced table") {
    val df = MatchEvaluator.bindingsCoalesced(ev, Parser.parseMatch(PaperQueries.q5))
    val got = df.select("x", "z", "y", "ts", "te").collect().map { r =>
      (FigureOne.names(r.getLong(0)), FigureOne.names(r.getLong(1)),
       FigureOne.names(r.getLong(2)), r.getInt(3), r.getInt(4))
    }.toSet
    assert(got == Set(("n1", "e1", "n2", 5, 6), ("n2", "e2", "n3", 1, 2)))
  }

  test("Q6: PREV from a positive test — exactly (n6,9,n6,8)") {
    val got = TestUtil.named4(run(PaperQueries.q6), ("x", "x_time", "y", "y_time"))
    assert(got == Set(("n6", 9, "n6", 8)))
  }

  test("Q7 (three variables): exactly (n6,9,n6,8,n4,8)") {
    val got = TestUtil.named6(run(PaperQueries.q7Long),
                              Seq("x", "x_time", "y", "y_time", "z", "z_time"))
    assert(got == Set(("n6", 9, "n6", 8, "n4", 8)))
  }

  test("Q7 (simplified): exactly (n6,9,n4,8)") {
    val got = TestUtil.named4(run(PaperQueries.q7), ("x", "x_time", "z", "z_time"))
    assert(got == Set(("n6", 9, "n4", 8)))
  }

  test("Q8: rooms visited at or before the positive test — the paper's four rows") {
    val got = TestUtil.named4(run(PaperQueries.q8), ("x", "x_time", "z", "z_time"))
    assert(got == Set(
      ("n6", 9, "n4", 8), ("n6", 9, "n4", 7), ("n6", 9, "n5", 6), ("n6", 9, "n5", 5)))
  }

  test("Q9: high-risk met someone who later tested positive — the paper's three rows") {
    val got = TestUtil.named2(run(PaperQueries.q9), "x", "x_time")
    assert(got == Set(("n3", 4), ("n7", 5), ("n7", 6)))
  }

  test("intro query: Q9 with the endpoint bound — the paper's temporal binding table") {
    val got = TestUtil.named4(run(PaperQueries.q9Intro), ("x", "x_time", "y", "y_time"))
    assert(got == Set(("n7", 5, "n6", 9), ("n7", 6, "n6", 9), ("n3", 4, "n6", 9)))
  }

  test("Q10: positive at most an hour before the meeting — empty on Figure 1") {
    assert(run(PaperQueries.q10()).count() == 0)
  }

  test("Q11: close contact via a shared room — the paper's three rows") {
    val got = TestUtil.named2(run(PaperQueries.q11()), "x", "x_time")
    assert(got == Set(("n3", 7), ("n7", 7), ("n7", 8)))
  }

  test("Q12: meets or shared room, then positive within the window — six rows") {
    val got = TestUtil.named2(run(PaperQueries.q12()), "x", "x_time")
    assert(got == Set(("n3", 4), ("n3", 7), ("n7", 5), ("n7", 6), ("n7", 7), ("n7", 8)))
  }

  test("Q12 equals the pre-factoring form with NEXT[0,12] in both branches") {
    val unfactored =
      "MATCH (x:Person {risk = 'high'})-" +
        "/(FWD/:meets/FWD/NEXT[0,12] + FWD/:visits/FWD/:Room/BWD/:visits/BWD/NEXT[0,12])/" +
        "-({test = 'pos'}) ON contact_tracing"
    assert(TestUtil.named2(run(unfactored), "x", "x_time") ==
           TestUtil.named2(run(PaperQueries.q12()), "x", "x_time"))
  }

  test("Q1 coalesced bindings: one interval per person state") {
    val df = MatchEvaluator.bindingsCoalesced(ev, Parser.parseMatch(PaperQueries.q1))
    val got = df.collect().map(r => (FigureOne.names(r.getLong(0)), r.getInt(1), r.getInt(2))).toSet
    assert(got == Set(("n1", 1, 9), ("n2", 1, 9), ("n3", 1, 7), ("n6", 2, 9), ("n7", 5, 8)))
  }
}
