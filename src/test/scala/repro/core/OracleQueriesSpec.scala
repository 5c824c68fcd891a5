package repro.core

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec}
import repro.data.ContactTracing
import repro.tpg.{FigureOne, Itpg}

/** Every paper query's binding table, cross-checked against DuckDB SQL over
  * the point-expanded relations (recursive CTEs express the temporal
  * closures). Run on Figure 1 and on a small generated contact-tracing
  * graph, so the oracle also exercises the data generator's output.
  */
class OracleQueriesSpec extends SparkSpec {

  private def personPt(g: Itpg): DataFrame =
    g.toTpg.nodesP.filter("label = 'Person'")
      .selectExpr("id", "t", "props['risk'] AS risk", "props['test'] AS test")

  private def edgePt(g: Itpg): DataFrame =
    g.toTpg.edgesP.selectExpr("id", "src", "dst", "label", "t")

  private def check(g: Itpg, query: String, sql: String): Unit = {
    val ev = new IntervalEvaluator(g)
    val df = MatchEvaluator.bindingsPoints(ev, Parser.parseMatch(query))
    Oracle.assertEquivalent(df, sql, "person_pt" -> personPt(g), "edge_pt" -> edgePt(g))
  }

  // Forward / backward existence-chain CTEs shared by several queries.
  private val fwdCte =
    """WITH RECURSIVE fwd(id, t0, t) AS (
      |  SELECT id, CAST(t AS INT), CAST(t AS INT) FROM person_pt
      |  UNION
      |  SELECT f.id, f.t0, CAST(p.t AS INT) FROM fwd f
      |  JOIN person_pt p ON p.id = f.id AND CAST(p.t AS INT) = f.t + 1
      |)""".stripMargin
  private val bwdCte =
    """WITH RECURSIVE bwd(id, t0, t) AS (
      |  SELECT id, CAST(t AS INT), CAST(t AS INT) FROM person_pt
      |  UNION
      |  SELECT b.id, b.t0, CAST(p.t AS INT) FROM bwd b
      |  JOIN person_pt p ON p.id = b.id AND CAST(p.t AS INT) = b.t - 1
      |)""".stripMargin

  private val q1Sql = "SELECT id AS x, CAST(t AS INT) AS x_time FROM person_pt"
  private val q2Sql = q1Sql + " WHERE risk = 'low'"
  private val q3Sql = q2Sql + " AND CAST(t AS INT) = 1"
  private val q4Sql = q2Sql + " AND CAST(t AS INT) < 10"
  private val q5Sql =
    """SELECT a.id AS x, CAST(a.t AS INT) AS x_time, e.id AS z, CAST(e.t AS INT) AS z_time,
      |       b.id AS y, CAST(b.t AS INT) AS y_time
      |FROM person_pt a
      |JOIN edge_pt e ON e.src = a.id AND e.label = 'meets' AND e.t = a.t
      |JOIN person_pt b ON b.id = e.dst AND b.t = e.t
      |WHERE a.risk = 'low' AND b.risk = 'high'""".stripMargin
  private val q6Sql =
    """SELECT a.id AS x, CAST(a.t AS INT) AS x_time, b.id AS y, CAST(b.t AS INT) AS y_time
      |FROM person_pt a
      |JOIN person_pt b ON b.id = a.id AND CAST(b.t AS INT) = CAST(a.t AS INT) - 1
      |WHERE a.test = 'pos'""".stripMargin
  private val q7Sql =
    """SELECT a.id AS x, CAST(a.t AS INT) AS x_time, e.dst AS z, CAST(e.t AS INT) AS z_time
      |FROM person_pt a
      |JOIN person_pt b ON b.id = a.id AND CAST(b.t AS INT) = CAST(a.t AS INT) - 1
      |JOIN edge_pt e ON e.src = a.id AND e.label = 'visits' AND e.t = b.t
      |WHERE a.test = 'pos'""".stripMargin
  private val q8Sql = bwdCte +
    """
      |SELECT DISTINCT p.id AS x, b.t0 AS x_time, e.dst AS z, b.t AS z_time
      |FROM person_pt p
      |JOIN bwd b ON b.id = p.id AND b.t0 = CAST(p.t AS INT)
      |JOIN edge_pt e ON e.src = p.id AND e.label = 'visits' AND CAST(e.t AS INT) = b.t
      |WHERE p.test = 'pos'""".stripMargin
  private def q9Sql(bound: String = "", backward: Boolean = false) =
    (if (backward) bwdCte else fwdCte) +
      s"""
        |SELECT DISTINCT x.id AS x, CAST(x.t AS INT) AS x_time
        |FROM person_pt x
        |JOIN edge_pt e ON e.src = x.id AND e.label = 'meets' AND e.t = x.t
        |JOIN ${if (backward) "bwd" else "fwd"} f ON f.id = e.dst AND f.t0 = CAST(x.t AS INT) $bound
        |JOIN person_pt yp ON yp.id = f.id AND CAST(yp.t AS INT) = f.t AND yp.test = 'pos'
        |WHERE x.risk = 'high'""".stripMargin
  private val q11SqlBody =
    """
      |SELECT DISTINCT x.id AS x, CAST(x.t AS INT) AS x_time
      |FROM person_pt x
      |JOIN edge_pt ev1 ON ev1.src = x.id AND ev1.label = 'visits' AND ev1.t = x.t
      |JOIN edge_pt ev2 ON ev2.dst = ev1.dst AND ev2.label = 'visits' AND ev2.t = x.t
      |JOIN fwd f ON f.id = ev2.src AND f.t0 = CAST(x.t AS INT) AND f.t - f.t0 <= 12
      |JOIN person_pt yp ON yp.id = f.id AND CAST(yp.t AS INT) = f.t AND yp.test = 'pos'
      |WHERE x.risk = 'high'""".stripMargin
  private val q11Sql = fwdCte + q11SqlBody
  private val q12Sql = fwdCte +
    """
      |SELECT DISTINCT x, x_time FROM (
      |SELECT x.id AS x, CAST(x.t AS INT) AS x_time
      |FROM person_pt x
      |JOIN edge_pt e ON e.src = x.id AND e.label = 'meets' AND e.t = x.t
      |JOIN fwd f ON f.id = e.dst AND f.t0 = CAST(x.t AS INT) AND f.t - f.t0 <= 12
      |JOIN person_pt yp ON yp.id = f.id AND CAST(yp.t AS INT) = f.t AND yp.test = 'pos'
      |WHERE x.risk = 'high'
      |UNION ALL""".stripMargin + q11SqlBody + ") u"

  lazy val fig: Itpg = FigureOne.itpg(spark)
  lazy val gen: Itpg = {
    val g = ContactTracing.generate(spark,
      ContactTracing.Params(persons = 40, positivity = 0.2, seed = 11L))
    g.nodes.cache(); g.edges.cache(); g
  }

  test("Q1 vs DuckDB on Figure 1")(check(fig, PaperQueries.q1, q1Sql))
  test("Q2 vs DuckDB on Figure 1")(check(fig, PaperQueries.q2, q2Sql))
  test("Q3 vs DuckDB on Figure 1")(check(fig, PaperQueries.q3, q3Sql))
  test("Q4 vs DuckDB on Figure 1")(check(fig, PaperQueries.q4, q4Sql))
  test("Q5 vs DuckDB on Figure 1")(check(fig, PaperQueries.q5, q5Sql))
  test("Q6 vs DuckDB on Figure 1")(check(fig, PaperQueries.q6, q6Sql))
  test("Q7 vs DuckDB on Figure 1")(check(fig, PaperQueries.q7, q7Sql))
  test("Q8 vs DuckDB on Figure 1")(check(fig, PaperQueries.q8, q8Sql))
  test("Q9 vs DuckDB on Figure 1")(check(fig, PaperQueries.q9, q9Sql()))
  test("Q10 vs DuckDB on Figure 1")(
    check(fig, PaperQueries.q10(), q9Sql("AND f.t0 - f.t <= 12", backward = true)))
  test("Q11 vs DuckDB on Figure 1")(check(fig, PaperQueries.q11(), q11Sql))
  test("Q12 vs DuckDB on Figure 1")(check(fig, PaperQueries.q12(), q12Sql))

  test("Q5 vs DuckDB on a generated graph")(check(gen, PaperQueries.q5, q5Sql))
  test("Q8 vs DuckDB on a generated graph")(check(gen, PaperQueries.q8, q8Sql))
  test("Q9 vs DuckDB on a generated graph")(check(gen, PaperQueries.q9, q9Sql()))
  test("Q10 vs DuckDB on a generated graph")(
    check(gen, PaperQueries.q10(), q9Sql("AND f.t0 - f.t <= 12", backward = true)))
  test("Q11 vs DuckDB on a generated graph")(check(gen, PaperQueries.q11(), q11Sql))
  test("Q12 vs DuckDB on a generated graph")(check(gen, PaperQueries.q12(), q12Sql))
}
