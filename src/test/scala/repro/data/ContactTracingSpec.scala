package repro.data

import repro.SparkSpec
import repro.tpg.Itpg

/** Generator invariants: model validity, determinism, Table-I calibration,
  * and the Section VII-A properties (bi-directional meets, positivity,
  * high-risk share).
  */
class ContactTracingSpec extends SparkSpec {

  lazy val g: Itpg = {
    val x = ContactTracing.generate(spark, ContactTracing.Params(persons = 200, seed = 7L))
    x.nodes.cache(); x.edges.cache(); x
  }

  test("generated graph is a valid ITPG") {
    assert(g.validate().isEmpty)
  }

  test("node labels are Person and Room only; 100 rooms") {
    val labels = g.nodes.select("label").distinct().collect().map(_.getString(0)).toSet
    assert(labels == Set("Person", "Room"))
    assert(g.nodes.filter("label = 'Room'").select("id").distinct().count() == 100)
  }

  test("edge labels are visits and meets; visits point at rooms") {
    val labels = g.edges.select("label").distinct().collect().map(_.getString(0)).toSet
    assert(labels.subsetOf(Set("visits", "meets")) && labels.contains("visits"))
    val badVisit = g.edges.filter("label = 'visits' AND dst < 500000")
    assert(badVisit.count() == 0)
  }

  test("meets edges are materialized in both directions") {
    val m = g.edges.filter("label = 'meets'").select("src", "dst", "ts", "te")
    val rev = m.selectExpr("dst AS src", "src AS dst", "ts", "te")
    assert(m.exceptAll(rev).count() == 0)
  }

  test("generation is deterministic in the seed") {
    val a = ContactTracing.generate(spark, ContactTracing.Params(persons = 120, seed = 3L))
    val b = ContactTracing.generate(spark, ContactTracing.Params(persons = 120, seed = 3L))
    assert(ContactTracing.stats(a) == ContactTracing.stats(b))
    val c = ContactTracing.generate(spark, ContactTracing.Params(persons = 120, seed = 4L))
    assert(ContactTracing.stats(a) != ContactTracing.stats(c))
  }

  test("high-risk share is close to 18%") {
    val persons = g.nodes.filter("label = 'Person'")
      .selectExpr("id", "props['risk'] AS risk").distinct()
    val total = persons.select("id").distinct().count().toDouble
    val high = persons.filter("risk = 'high'").select("id").distinct().count()
    assert(math.abs(high / total - 0.18) < 0.09, s"high-risk share ${high / total}")
  }

  test("positivity share is close to the parameter") {
    val pos = g.nodes.filter("props['test'] = 'pos'").select("id").distinct().count().toDouble
    val total = g.nodes.filter("label = 'Person'").select("id").distinct().count().toDouble
    assert(math.abs(pos / total - 0.10) < 0.07, s"positivity ${pos / total}")
  }

  test("positive persons stay positive until the end of their lifespan") {
    // no neg state row may start after a pos state row of the same person
    val pos = g.nodes.filter("props['test'] = 'pos'").selectExpr("id", "ts AS pts")
    val neg = g.nodes.filter("props['test'] = 'neg'").selectExpr("id", "ts AS nts")
    val bad = pos.join(neg, "id").filter("nts > pts")
    assert(bad.count() == 0)
  }

  test("risk is constant over a person's lifetime") {
    val distinctRisk = g.nodes.filter("label = 'Person'")
      .selectExpr("id", "props['risk'] AS risk").distinct()
      .groupBy("id").count().filter("count > 1")
    assert(distinctRisk.count() == 0)
  }

  test("temporal domain is [1,48] and all intervals respect it") {
    assert(g.omegaLo == 1 && g.omegaHi == 48)
    assert(g.nodes.filter("ts < 1 OR te > 48").count() == 0)
    assert(g.edges.filter("ts < 1 OR te > 48").count() == 0)
  }

  test("edge counts grow superlinearly with persons (between Table-I knots)") {
    // below G1 the calibration extrapolates linearly by design, so compare
    // the paper's own scale points: G1→G2 doubles persons but ×2.5 edges
    val s1 = ContactTracing.stats(
      ContactTracing.generate(spark, ContactTracing.Params(persons = 1000, seed = 9L)))
    val s2 = ContactTracing.stats(
      ContactTracing.generate(spark, ContactTracing.Params(persons = 2000, seed = 9L)))
    assert(s2._1 > s1._1)
    assert(s2._2.toDouble / s1._2 > 2.2, s"edges ${s1._2} -> ${s2._2}")
  }

  test("targetEdges interpolates the Table-I knots exactly") {
    ContactTracing.paperScales.foreach { case (_, p, e) =>
      assert(math.abs(ContactTracing.targetEdges(p) - e) / e < 1e-9)
    }
  }

  test("targetEdges is monotone between knots") {
    assert(ContactTracing.targetEdges(3000) > ContactTracing.targetEdges(2000))
    assert(ContactTracing.targetEdges(3000) < ContactTracing.targetEdges(4000))
  }

  test("meet-slot calibration lands the edge count within 2x of the target") {
    val p = ContactTracing.Params(persons = 800, seed = 21L)
    val (_, edges, _, _) = ContactTracing.stats(ContactTracing.generate(spark, p))
    val target = ContactTracing.targetEdges(800)
    assert(edges > target / 2 && edges < target * 2, s"edges=$edges target=$target")
  }

  test("generateScale resolves the paper's scale names") {
    assertThrows[IllegalArgumentException](ContactTracing.generateScale(spark, "G99"))
    // G1 is 1000 persons
    assert(ContactTracing.paperScales.head == (("G1", 1000, 12000L)))
  }
}
