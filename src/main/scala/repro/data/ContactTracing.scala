package repro.data

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._

import repro.tpg.{Intervals, Itpg}

/** Synthetic contact-tracing ITPG generator replicating Section VII-A.
  *
  * The paper builds its graphs from a (itself synthetic) campus trajectory
  * dataset: Person and Room nodes, `visits` edges Person→Room, and
  * bi-directional `meets` edges between persons co-located at one of 310
  * meeting locations during the same 5-minute window; Ω has 48 windows; 18%
  * of persons are high-risk; 2–10% test positive at a uniform time and stay
  * positive for the rest of their lifespan.
  *
  * We reproduce that shape: each person has 1–3 validity sessions inside
  * Ω = [1,48] (the paper's persons exist only around their campus visits,
  * giving ≈3.4 temporal node rows per node in Table I), visits classrooms
  * (popularity-skewed over 100 rooms) during sessions, and attends meeting
  * slots at `meetLocs` locations; `meets` edges come from the co-location
  * self-join and are materialized in both directions (separate edge ids).
  * The per-person meeting-slot rate is calibrated against the Table-I scale
  * points so edge counts track the paper's (DESIGN.md §6).
  */
object ContactTracing {

  /** (name, persons, edges) scale points of paper Table I. */
  val paperScales: Seq[(String, Int, Long)] = Seq(
    ("G1", 1000, 12000L), ("G2", 2000, 30000L), ("G3", 4000, 84000L),
    ("G4", 6000, 158000L), ("G5", 8000, 253000L), ("G6", 10000, 371000L),
    ("G7", 25000, 2046000L), ("G8", 50000, 7370000L), ("G9", 75000, 15717000L),
    ("G10", 100000, 28996000L))

  final case class Params(
      persons: Int,
      rooms: Int = 100,
      meetLocs: Int = 310,
      tMax: Int = 48,
      highRisk: Double = 0.18,
      positivity: Double = 0.10,
      seed: Long = 42L)

  private val RoomBase = 500000L
  private val VisitBase = 1000000000L
  private val MeetBase = 2000000000L

  /** Paper edge-count target for P persons (log-log interpolation of the
    * Table-I scale points; clamped at the ends).
    */
  def targetEdges(persons: Int): Double = {
    val pts = paperScales.map { case (_, p, e) => (math.log(p.toDouble), math.log(e.toDouble)) }
    val x = math.log(math.max(persons, 1).toDouble)
    if (x <= pts.head._1) math.exp(pts.head._2 + (x - pts.head._1))
    else if (x >= pts.last._1) {
      val (x1, y1) = pts(pts.size - 2); val (x2, y2) = pts.last
      math.exp(y2 + (x - x2) * (y2 - y1) / (x2 - x1))
    } else {
      val i = pts.lastIndexWhere(_._1 <= x)
      val (x1, y1) = pts(i); val (x2, y2) = pts(i + 1)
      math.exp(y1 + (x - x1) * (y2 - y1) / (x2 - x1))
    }
  }

  /** Mean meeting slots per person so the co-location join yields roughly
    * the target number of (directed) meets edges:
    * E[edges] ≈ (P·k)² / cells  ⇒  k = sqrt(E·cells) / P.
    */
  def meetSlotsPerPerson(p: Params): Double = {
    val cells = p.meetLocs.toDouble * p.tMax
    val visitsEst = 4.5 * p.persons // ≈ sessions × visits/session
    val target = math.max(targetEdges(p.persons) - visitsEst, p.persons.toDouble)
    math.sqrt(target * cells) / p.persons
  }

  /** Generate the ITPG. Deterministic in (params, seed). */
  def generate(spark: SparkSession, p: Params): Itpg = {
    import spark.implicits._
    val s = p.seed
    val T = p.tMax

    // -- persons with attributes -------------------------------------------
    val persons = spark.range(p.persons.toLong).select(
      $"id",
      // 2–4 validity sessions per person: the paper's graphs average ≈3.5
      // temporal node rows per node (Table I)
      (rand(s) * 3 + 2).cast("int").as("nSess"),
      when(rand(s + 1) < p.highRisk, "high").otherwise("low").as("risk"),
      (rand(s + 2) < p.positivity).as("isPos"),
      rand(s + 3).as("posR"))

    // -- validity sessions --------------------------------------------------
    val sessions = persons
      .select($"id", $"nSess", posexplode(array_repeat(lit(0), $"nSess")).as(Seq("sessIdx", "_z")))
      .select(
        $"id", $"nSess", $"sessIdx",
        (rand(s + 4) * (T - 4) + 1).cast("int").as("sa"),
        (rand(s + 5) * 4 + 1).cast("int").as("slen"))
      .select($"id", $"nSess", $"sessIdx", $"sa", least(lit(T), $"sa" + $"slen").as("sb"))

    // -- classroom visits (popularity-skewed rooms) ------------------------
    val visitsRaw = sessions
      .select($"id", $"sa", $"sb",
        posexplode(array_repeat(lit(0), (rand(s + 6) * 2 + 1).cast("int"))).as(Seq("vIdx", "_z")))
      .select(
        $"id", $"sa", $"sb", $"vIdx",
        // rand^2 skews toward low room indexes (popular classrooms).
        (pow(rand(s + 7), 2.0) * p.rooms).cast("int").as("room"),
        (rand(s + 8) * ($"sb" - $"sa" + 1)).cast("int").as("voff"),
        (rand(s + 9) * 3).cast("int").as("vlen"))
      .select($"id", $"room",
        ($"sa" + $"voff").as(Intervals.Ts),
        least($"sb", $"sa" + $"voff" + $"vlen").as(Intervals.Te))
      .filter(col(Intervals.Ts) <= col(Intervals.Te))
    val visitIv = Intervals.coalesce(visitsRaw, Seq("id", "room")).cache()

    // -- meeting slots and co-location -------------------------------------
    val k = meetSlotsPerPerson(p)
    val slots = sessions
      .withColumn("mu", lit(k) / $"nSess")
      .withColumn("nSlots",
        (floor($"mu") + when(rand(s + 10) < ($"mu" - floor($"mu")), 1).otherwise(0)).cast("int"))
      .select($"id", $"sa", $"sb",
        posexplode(array_repeat(lit(0), $"nSlots")).as(Seq("slotIdx", "_z")))
      .select(
        $"id",
        (rand(s + 11) * p.meetLocs).cast("int").as("loc"),
        ($"sa" + (rand(s + 12) * ($"sb" - $"sa" + 1)).cast("int")).as("t"))
      .distinct()

    val a = slots.select($"loc", $"t", $"id".as("pa"))
    val b = slots.select($"loc", $"t", $"id".as("pb"))
    val meetPts = a.join(b, Seq("loc", "t")).filter($"pa" =!= $"pb")
      .select($"pa".as("src"), $"pb".as("dst"), $"t").distinct()
    val meetIv = Intervals.coalesce(
      meetPts.select($"src", $"dst", $"t".as(Intervals.Ts), $"t".as(Intervals.Te)),
      Seq("src", "dst")).cache()

    // -- person existence = sessions; clip visit/meet times into it by
    //    construction (both are drawn within sessions) ----------------------
    val exist = Intervals.coalesce(
      sessions.select($"id", $"sa".as(Intervals.Ts), $"sb".as(Intervals.Te)), Seq("id"))

    // Positive-test time: a uniform point of the person's lifespan.
    val span = exist.groupBy("id").agg(min(Intervals.Ts).as("lo"), max(Intervals.Te).as("hi"))
    val attrs = persons.join(span, "id").select(
      $"id", $"risk", $"isPos",
      ($"lo" + ($"posR" * ($"hi" - $"lo" + 1)).cast("int")).as("posT"))

    // Split existence state rows at posT for positive persons.
    val ex = exist.join(attrs, "id")
    val negRows = ex
      .withColumn("_te", when($"isPos", least(col(Intervals.Te), $"posT" - 1))
                           .otherwise(col(Intervals.Te)))
      .filter(col(Intervals.Ts) <= col("_te"))
      .select($"id", $"risk", lit("neg").as("test"), col(Intervals.Ts), col("_te").as(Intervals.Te))
    val posRows = ex.filter($"isPos")
      .withColumn("_ts", greatest(col(Intervals.Ts), $"posT"))
      .filter(col("_ts") <= col(Intervals.Te))
      .select($"id", $"risk", lit("pos").as("test"), col("_ts").as(Intervals.Ts), col(Intervals.Te))
    val personNodes = negRows.unionByName(posRows).select(
      $"id", lit("Person").as("label"),
      map(lit("name"), concat(lit("p"), $"id"), lit("risk"), $"risk", lit("test"), $"test")
        .as("props"),
      col(Intervals.Ts), col(Intervals.Te))

    val roomNodes = spark.range(p.rooms.toLong).select(
      ($"id" + RoomBase).as("id"), lit("Room").as("label"),
      map(lit("name"), concat(lit("r"), $"id")).as("props"),
      lit(1).as(Intervals.Ts), lit(T).as(Intervals.Te))

    val visitEdges = visitIv.select(
      (lit(VisitBase) + $"id" * p.rooms + $"room").as("id"),
      $"id".as("src"), ($"room" + RoomBase).as("dst"),
      lit("visits").as("label"), map().cast("map<string,string>").as("props"),
      col(Intervals.Ts), col(Intervals.Te))

    val meetEdges = meetIv.select(
      (lit(MeetBase) + $"src" * 1000000L + $"dst").as("id"),
      $"src", $"dst", lit("meets").as("label"),
      map().cast("map<string,string>").as("props"),
      col(Intervals.Ts), col(Intervals.Te))

    Itpg(1, T,
         personNodes.unionByName(roomNodes),
         visitEdges.unionByName(meetEdges))
  }

  /** Table-I statistics: (#nodes, #edges, #temporal nodes, #temporal edges). */
  def stats(g: Itpg): (Long, Long, Long, Long) = {
    val nodes = g.nodes.select("id").distinct().count()
    val edges = g.edges.select("id").distinct().count()
    val tn = g.nodes.count()
    val te = g.edges.count()
    (nodes, edges, tn, te)
  }

  /** Convenience: generate the paper's Gi scale by name ("G1".."G10"). */
  def generateScale(spark: SparkSession, name: String,
                    positivity: Double = 0.10, seed: Long = 42L): Itpg = {
    val p = paperScales.find(_._1 == name)
      .getOrElse(throw new IllegalArgumentException(s"unknown scale $name"))._2
    generate(spark, Params(persons = p, positivity = positivity, seed = seed))
  }
}
