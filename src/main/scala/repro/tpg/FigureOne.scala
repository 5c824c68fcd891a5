package repro.tpg

import org.apache.spark.sql.SparkSession

/** Typed state-row helpers for building small ITPGs in code. */
final case class NodeRow(id: Long, label: String, props: Map[String, String], ts: Int, te: Int)
final case class EdgeRow(id: Long, src: Long, dst: Long, label: String,
                         props: Map[String, String], ts: Int, te: Int)

/** The paper's running-example TPG (Figure 1), reconstructed from every
  * constraint the text states: Ω = [1,11]; the Appendix-A facts
  * ξ(n2)={[1,9]}, ξ(n3)={[1,7]}, ξ(e2)={[1,2]},
  * σ(n2,risk)={(low,[1,4]),(high,[5,9])}; the Section-VI sample rows for n2
  * and e1; and the expected binding tables of the intro query and Q1–Q12.
  * DESIGN.md §5 documents the reconstruction and the places where the figure
  * leaves freedom (names of n3/n7, cohabits endpoints, loc values).
  *
  * meets/cohabits edges are stored in a single direction (the direction the
  * paper's Q5/Q9 outputs imply); `visits` is directed Person→Room.
  */
object FigureOne {

  val nodeIds: Map[String, Long] =
    Map("n1" -> 1L, "n2" -> 2L, "n3" -> 3L, "n4" -> 4L, "n5" -> 5L, "n6" -> 6L, "n7" -> 7L)
  val edgeIds: Map[String, Long] =
    Map("e1" -> 101L, "e2" -> 102L, "e3" -> 103L, "e4" -> 104L, "e5" -> 105L,
        "e6" -> 106L, "e7" -> 107L, "e8" -> 108L, "e9" -> 109L, "e10" -> 110L)

  /** id → display name ("n1", …, "e10") for readable test assertions. */
  val names: Map[Long, String] = (nodeIds ++ edgeIds).map(_.swap)

  val omegaLo = 1
  val omegaHi = 11

  val nodeRows: Seq[NodeRow] = Seq(
    NodeRow(1, "Person", Map("name" -> "Ann", "risk" -> "low", "test" -> "neg"), 1, 9),
    NodeRow(2, "Person", Map("name" -> "Bob", "risk" -> "low", "test" -> "neg"), 1, 4),
    NodeRow(2, "Person", Map("name" -> "Bob", "risk" -> "high", "test" -> "neg"), 5, 9),
    NodeRow(3, "Person", Map("name" -> "Cam", "risk" -> "high", "test" -> "neg"), 1, 7),
    NodeRow(4, "Room", Map("name" -> "R101"), 1, 11),
    NodeRow(5, "Room", Map("name" -> "R102"), 1, 11),
    NodeRow(6, "Person", Map("name" -> "Eve", "risk" -> "low", "test" -> "neg"), 2, 8),
    NodeRow(6, "Person", Map("name" -> "Eve", "risk" -> "low", "test" -> "pos"), 9, 9),
    NodeRow(7, "Person", Map("name" -> "Dan", "risk" -> "high", "test" -> "neg"), 5, 8),
  )

  val edgeRows: Seq[EdgeRow] = Seq(
    EdgeRow(101, 1, 2, "meets", Map("loc" -> "cafe"), 3, 3),
    EdgeRow(101, 1, 2, "meets", Map("loc" -> "park"), 5, 6),
    EdgeRow(102, 2, 3, "meets", Map("loc" -> "park"), 1, 2),
    EdgeRow(103, 3, 6, "meets", Map("loc" -> "gym"), 4, 4),
    EdgeRow(104, 7, 6, "meets", Map("loc" -> "lab"), 5, 6),
    EdgeRow(105, 2, 3, "cohabits", Map.empty, 1, 7),
    EdgeRow(106, 1, 2, "cohabits", Map.empty, 1, 9),
    EdgeRow(107, 6, 5, "visits", Map.empty, 5, 6),
    EdgeRow(108, 6, 4, "visits", Map.empty, 7, 8),
    EdgeRow(109, 3, 4, "visits", Map.empty, 7, 7),
    EdgeRow(110, 7, 4, "visits", Map.empty, 7, 8),
  )

  /** Materialize the Figure-1 ITPG in the given session. */
  def itpg(spark: SparkSession): Itpg = build(spark, omegaLo, omegaHi, nodeRows, edgeRows)

  /** Build an ITPG from typed state rows (also used by test micro-graphs). */
  def build(spark: SparkSession, lo: Int, hi: Int,
            nodes: Seq[NodeRow], edges: Seq[EdgeRow]): Itpg = {
    import spark.implicits._
    Itpg(lo, hi, nodes.toDF(), edges.toDF())
  }
}
