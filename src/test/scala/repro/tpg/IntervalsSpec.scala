package repro.tpg

import org.apache.spark.sql.DataFrame
import org.scalacheck.Gen
import org.scalacheck.rng.Seed

import repro.SparkSpec

/** Interval algebra: hand cases + ScalaCheck properties checked against
  * brute-force point-set semantics. Random cases are batched into a single
  * DataFrame per property (one Spark job, many cases).
  */
class IntervalsSpec extends SparkSpec {

  import spark.implicits._

  private def df(rows: Seq[(Long, Int, Int)]): DataFrame = rows.toDF("id", "ts", "te")

  private def collectIv(d: DataFrame): Map[Long, Set[(Int, Int)]] =
    d.select("id", "ts", "te").collect()
      .map(r => (r.getLong(0), (r.getInt(1), r.getInt(2))))
      .groupBy(_._1).view.mapValues(_.map(_._2).toSet).toMap

  private def points(ivs: Iterable[(Int, Int)]): Set[Int] =
    ivs.flatMap { case (a, b) => a to b }.toSet

  /** Reference coalescing: maximal runs of the point set. */
  private def refCoalesce(ivs: Iterable[(Int, Int)]): Set[(Int, Int)] = {
    val ps = points(ivs).toSeq.sorted
    val out = scala.collection.mutable.ListBuffer.empty[(Int, Int)]
    ps.foreach { p =>
      out.lastOption match {
        case Some((a, b)) if p == b + 1 => out.update(out.size - 1, (a, p))
        case _                          => out += ((p, p))
      }
    }
    out.toSet
  }

  private def sample[A](g: Gen[A], n: Int, seed: Long): Seq[A] =
    (0 until n).map(i => g.pureApply(Gen.Parameters.default, Seed(seed + i)))

  private val ivGen: Gen[(Int, Int)] = for {
    a <- Gen.choose(0, 15)
    len <- Gen.choose(0, 5)
  } yield (a, math.min(15, a + len))

  private val ivListGen: Gen[List[(Int, Int)]] = Gen.choose(0, 6).flatMap(Gen.listOfN(_, ivGen))

  // ---- coalesce -----------------------------------------------------------

  test("coalesce merges overlapping intervals") {
    assert(collectIv(Intervals.coalesce(df(Seq((1L, 1, 5), (1L, 3, 8))), Seq("id"))) ==
           Map(1L -> Set((1, 8))))
  }

  test("coalesce merges adjacent intervals") {
    assert(collectIv(Intervals.coalesce(df(Seq((1L, 1, 2), (1L, 3, 4))), Seq("id"))) ==
           Map(1L -> Set((1, 4))))
  }

  test("coalesce keeps gapped intervals apart") {
    assert(collectIv(Intervals.coalesce(df(Seq((1L, 1, 2), (1L, 4, 5))), Seq("id"))) ==
           Map(1L -> Set((1, 2), (4, 5))))
  }

  test("coalesce handles containment") {
    assert(collectIv(Intervals.coalesce(df(Seq((1L, 1, 9), (1L, 3, 4))), Seq("id"))) ==
           Map(1L -> Set((1, 9))))
  }

  test("coalesce is per key") {
    assert(collectIv(Intervals.coalesce(df(Seq((1L, 1, 2), (2L, 3, 4))), Seq("id"))) ==
           Map(1L -> Set((1, 2)), 2L -> Set((3, 4))))
  }

  test("coalesce of empty input is empty") {
    assert(Intervals.coalesce(df(Seq.empty), Seq("id")).count() == 0)
  }

  test("coalesce property: equals maximal runs of the point set (50 random cases)") {
    val cases = sample(ivListGen, 50, 1000L)
    val input = cases.zipWithIndex.flatMap { case (ivs, i) => ivs.map(iv => (i.toLong, iv._1, iv._2)) }
    val got = collectIv(Intervals.coalesce(df(input), Seq("id")))
    cases.zipWithIndex.foreach { case (ivs, i) =>
      val exp = refCoalesce(ivs)
      assert(got.getOrElse(i.toLong, Set.empty) == exp, s"case $i: $ivs")
    }
  }

  // ---- intersect / union --------------------------------------------------

  test("intersect of disjoint families is empty") {
    val out = Intervals.intersect(df(Seq((1L, 1, 2))), df(Seq((1L, 4, 6))), Seq("id"))
    assert(out.count() == 0)
  }

  test("intersect clips overlaps") {
    val out = Intervals.intersect(df(Seq((1L, 1, 5))), df(Seq((1L, 3, 8))), Seq("id"))
    assert(collectIv(out) == Map(1L -> Set((3, 5))))
  }

  test("intersect requires matching keys") {
    val out = Intervals.intersect(df(Seq((1L, 1, 5))), df(Seq((2L, 1, 5))), Seq("id"))
    assert(out.count() == 0)
  }

  test("intersect property: point-set intersection (40 random cases)") {
    val as = sample(ivListGen, 40, 2000L)
    val bs = sample(ivListGen, 40, 3000L)
    val da = df(as.zipWithIndex.flatMap { case (l, i) => l.map(iv => (i.toLong, iv._1, iv._2)) })
    val db = df(bs.zipWithIndex.flatMap { case (l, i) => l.map(iv => (i.toLong, iv._1, iv._2)) })
    // inputs must be coalesced per the contract
    val got = collectIv(Intervals.intersect(
      Intervals.coalesce(da, Seq("id")), Intervals.coalesce(db, Seq("id")), Seq("id")))
    as.indices.foreach { i =>
      val exp = points(as(i)) intersect points(bs(i))
      assert(points(got.getOrElse(i.toLong, Set.empty)) == exp, s"case $i")
    }
  }

  test("union property: point-set union, coalesced output (40 random cases)") {
    val as = sample(ivListGen, 40, 4000L)
    val bs = sample(ivListGen, 40, 5000L)
    val da = df(as.zipWithIndex.flatMap { case (l, i) => l.map(iv => (i.toLong, iv._1, iv._2)) })
    val db = df(bs.zipWithIndex.flatMap { case (l, i) => l.map(iv => (i.toLong, iv._1, iv._2)) })
    val got = collectIv(Intervals.union(da, db, Seq("id")))
    as.indices.foreach { i =>
      val exp = refCoalesce(as(i) ++ bs(i))
      assert(got.getOrElse(i.toLong, Set.empty) == exp, s"case $i")
    }
  }

  // ---- complement ---------------------------------------------------------

  test("complement carves gaps and boundaries") {
    val universe = Seq(1L).toDF("id")
    val out = Intervals.complement(df(Seq((1L, 2, 3), (1L, 6, 7))), universe, Seq("id"), 0, 9)
    assert(collectIv(out) == Map(1L -> Set((0, 1), (4, 5), (8, 9))))
  }

  test("complement of an absent key is the full range") {
    val universe = Seq(1L, 2L).toDF("id")
    val out = Intervals.complement(df(Seq((1L, 0, 9))), universe, Seq("id"), 0, 9)
    assert(collectIv(out) == Map(2L -> Set((0, 9))))
  }

  test("complement of a full cover is empty") {
    val universe = Seq(1L).toDF("id")
    val out = Intervals.complement(df(Seq((1L, 0, 9))), universe, Seq("id"), 0, 9)
    assert(out.count() == 0)
  }

  test("complement property: point-set complement (40 random cases)") {
    val as = sample(ivListGen, 40, 6000L)
    val universe = as.indices.map(_.toLong).toDF("id")
    val da = Intervals.coalesce(
      df(as.zipWithIndex.flatMap { case (l, i) => l.map(iv => (i.toLong, iv._1, iv._2)) }),
      Seq("id"))
    val got = collectIv(Intervals.complement(da, universe, Seq("id"), 0, 15))
    as.indices.foreach { i =>
      val exp = (0 to 15).toSet -- points(as(i))
      assert(points(got.getOrElse(i.toLong, Set.empty)) == exp, s"case $i: ${as(i)}")
    }
  }

  // ---- points -------------------------------------------------------------

  test("points expands inclusively") {
    val out = Intervals.points(df(Seq((1L, 2, 4))), Seq("id"))
    assert(out.collect().map(r => (r.getLong(0), r.getInt(1))).toSet ==
           Set((1L, 2), (1L, 3), (1L, 4)))
  }

  test("overlaps predicate matches interval overlap") {
    import org.apache.spark.sql.functions._
    val d = Seq((1, 3, 2, 5, true), (1, 2, 3, 5, false), (4, 6, 1, 4, true))
      .toDF("a", "b", "c", "d", "exp")
    val bad = d.filter(Intervals.overlaps(col("a"), col("b"), col("c"), col("d")) =!= col("exp"))
    assert(bad.count() == 0)
  }
}
