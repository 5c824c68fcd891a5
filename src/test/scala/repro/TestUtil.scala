package repro

import org.apache.spark.sql.DataFrame

import repro.tpg.{EdgeRow, FigureOne, Itpg, NodeRow}

/** Collect helpers shared by the suites. */
object TestUtil {

  /** `(o1, t1, o2, t2)` rows as a set. */
  def tuples4(df: DataFrame): Set[(Long, Int, Long, Int)] =
    df.select("o1", "t1", "o2", "t2").collect()
      .map(r => (r.getLong(0), r.getInt(1), r.getLong(2), r.getInt(3))).toSet

  /** `(id, t)` rows as a set. */
  def pairs(df: DataFrame): Set[(Long, Int)] =
    df.select("id", "t").collect().map(r => (r.getLong(0), r.getInt(1))).toSet

  /** `(id, ts, te)` rows as a set. */
  def ivs(df: DataFrame): Set[(Long, Int, Int)] =
    df.select("id", "ts", "te").collect().map(r => (r.getLong(0), r.getInt(1), r.getInt(2))).toSet

  /** Binding-table rows rendered with Figure-1 names, e.g. ("n6", 9, "n4", 8). */
  def named2(df: DataFrame, v1: String, v2: String): Set[(String, Int)] =
    df.select(v1, v2).collect()
      .map(r => (FigureOne.names(r.getLong(0)), r.getInt(1))).toSet

  def named4(df: DataFrame, cols: (String, String, String, String)): Set[(String, Int, String, Int)] =
    df.select(cols._1, cols._2, cols._3, cols._4).collect()
      .map(r => (FigureOne.names(r.getLong(0)), r.getInt(1),
                 FigureOne.names(r.getLong(2)), r.getInt(3))).toSet

  def named6(df: DataFrame, cols: Seq[String]): Set[(String, Int, String, Int, String, Int)] =
    df.select(cols.head, cols.tail: _*).collect()
      .map(r => (FigureOne.names(r.getLong(0)), r.getInt(1),
                 FigureOne.names(r.getLong(2)), r.getInt(3),
                 FigureOne.names(r.getLong(4)), r.getInt(5))).toSet

  /** Point-set composition — reference semantics for join-based operators. */
  def composeSets(a: Set[(Long, Int, Long, Int)],
                  b: Set[(Long, Int, Long, Int)]): Set[(Long, Int, Long, Int)] =
    for {
      (o1, t1, om, tm) <- a
      (p1, u1, o2, t2) <- b
      if p1 == om && u1 == tm
    } yield (o1, t1, o2, t2)
}

/** Deterministic micro-graphs for evaluator tests. */
object TestGraphs {

  /** 2 labels, an existence gap on `a`, a property change, one edge.
    * Ω = [0,5]; ids: a=1, b=2, e=10.
    */
  def tiny(spark: org.apache.spark.sql.SparkSession): Itpg =
    FigureOne.build(spark, 0, 5,
      nodes = Seq(
        NodeRow(1, "A", Map("p" -> "u"), 0, 1),
        NodeRow(1, "A", Map("p" -> "w"), 2, 2),
        NodeRow(1, "A", Map("p" -> "u"), 4, 5),
        NodeRow(2, "B", Map("q" -> "v"), 0, 5)),
      edges = Seq(
        EdgeRow(10, 1, 2, "r", Map.empty, 1, 2)))

  /** The paper's "room unavailable" example: one Room node with a gap. */
  def room(spark: org.apache.spark.sql.SparkSession): Itpg =
    FigureOne.build(spark, 0, 8,
      nodes = Seq(
        NodeRow(1, "Room", Map.empty, 0, 2),
        NodeRow(1, "Room", Map.empty, 6, 8)),
      edges = Seq.empty)

  /** Seeded random small ITPG honouring the validity constraints. */
  def random(spark: org.apache.spark.sql.SparkSession, seed: Long): Itpg = {
    val rnd = new scala.util.Random(seed)
    val lo = 0; val hi = 7
    val labels = Seq("A", "B")
    val nNodes = 4 + rnd.nextInt(3)
    def randIv(): (Int, Int) = {
      val a = lo + rnd.nextInt(hi - lo + 1)
      val b = math.min(hi, a + rnd.nextInt(4))
      (a, b)
    }
    val nodeExist: Map[Long, Seq[(Int, Int)]] = (1 to nNodes).map { i =>
      val ivs = (0 to rnd.nextInt(2)).map(_ => randIv())
      // coalesce driver-side
      val merged = ivs.sorted.foldLeft(List.empty[(Int, Int)]) {
        case ((a, b) :: rest, (c, d)) if c <= b + 1 => (a, math.max(b, d)) :: rest
        case (list, x)                              => x :: list
      }.reverse
      i.toLong -> merged
    }.toMap
    val nodes = nodeExist.toSeq.flatMap { case (id, ivs) =>
      val lab = labels(rnd.nextInt(labels.size))
      val props = if (rnd.nextBoolean()) Map("p" -> (if (rnd.nextBoolean()) "u" else "v"))
                  else Map.empty[String, String]
      ivs.map { case (a, b) => NodeRow(id, lab, props, a, b) }
    }
    val edges = (1 to 6).flatMap { j =>
      val s = 1L + rnd.nextInt(nNodes)
      val d = 1L + rnd.nextInt(nNodes)
      val (a, b) = randIv()
      // clip to both endpoints' existence to keep the graph valid
      for {
        (sa, sb) <- nodeExist(s)
        (da, db) <- nodeExist(d)
        l = Seq(a, sa, da).max
        h = Seq(b, sb, db).min
        if l <= h
      } yield EdgeRow(100L + j, s, d, "r", Map.empty, l, h)
    }
    // an edge id may produce several rows from different existence pieces —
    // they are disjoint by construction of the clipping, keep distinct
    FigureOne.build(spark, lo, hi, nodes, edges.distinct)
  }
}
