package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.tpg.{Band, Intervals, Itpg}
import Ast._

/** Interval-based TRPQ evaluation (paper Section VI, Steps 1–2 generalized).
  *
  * Every AST node denotes a *banded relation* (see [[repro.tpg.Band]]):
  * tests are identity bands over per-object satisfaction intervals, axes are
  * constant-delta bands, concatenation is band composition, and numerical
  * occurrence indicators reuse [[Repetition]] over the band algebra. All
  * interval reasoning (Allen intersection, delta shifting, coalescing)
  * happens on interval endpoints — no point expansion until
  * [[evalPoints]] (Step 3).
  *
  * The representation is exact for the whole of NavL[PC,NOI], so this
  * evaluator always agrees with [[PointEvaluator]] after expansion.
  */
final class IntervalEvaluator(val g: Itpg) {

  val lo: Int = g.omegaLo
  val hi: Int = g.omegaHi

  private val memo = scala.collection.mutable.HashMap.empty[Path, DataFrame]
  private val memoT = scala.collection.mutable.HashMap.empty[Test, DataFrame]

  private lazy val idBand: DataFrame = Band.identity(g.objects.select("id"), lo, hi).cache()

  private def allObjIv: DataFrame =
    g.objects.select(col("id"), lit(lo).as(Intervals.Ts), lit(hi).as(Intervals.Te))

  private def emptyIv: DataFrame = allObjIv.filter(lit(false))

  private object ops extends RelOps {
    def id: DataFrame = idBand
    def compose(a: DataFrame, b: DataFrame): DataFrame = Band.compose(a, b)
    def union(a: DataFrame, b: DataFrame): DataFrame = Band.union(a, b)
    def materialize(df: DataFrame): DataFrame = df.localCheckpoint()
    def size(df: DataFrame): Long = df.count()
  }

  /** Satisfaction intervals of `test`, as a coalesced `(id, ts, te)`. */
  def testIv(test: Test): DataFrame = memoT.getOrElseUpdate(test, test match {
    case IsNode      => g.objects.filter(col("kind") === "N")
                          .select(col("id"), lit(lo).as(Intervals.Ts), lit(hi).as(Intervals.Te))
    case IsEdge      => g.objects.filter(col("kind") === "E")
                          .select(col("id"), lit(lo).as(Intervals.Ts), lit(hi).as(Intervals.Te))
    case HasLabel(l) => g.objects.filter(col("label") === l)
                          .select(col("id"), lit(lo).as(Intervals.Ts), lit(hi).as(Intervals.Te))
    case PropIs(p, v) => g.propIv(p, v)
    case Exists       => g.existence
    case Lt(k) =>
      if (k - 1 < lo) emptyIv
      else g.objects.select(col("id"), lit(lo).as(Intervals.Ts),
                            lit(math.min(k - 1, hi)).as(Intervals.Te))
    case And(a, b) => Intervals.intersect(testIv(a), testIv(b), Seq("id"))
    case Or(a, b)  => Intervals.union(testIv(a), testIv(b), Seq("id"))
    case Not(x)    => Intervals.complement(testIv(x), g.objects.select("id"), Seq("id"), lo, hi)
    case PathCond(p) => Band.startsOf(evalBands(p))
  })

  /** `[[path]]_G` as a banded relation (Steps 1–2). */
  def evalBands(path: Path): DataFrame = memo.getOrElseUpdate(path, path match {
    case Tst(t) => Band.fromIntervals(testIv(t))
    case F =>
      val e = g.objects.filter(col("kind") === "E")
      val fromSrc = e.select(col("src").as("o1"), col("id").as("o2"))
      val toDst   = e.select(col("id").as("o1"), col("dst").as("o2"))
      axisBand(fromSrc.unionByName(toDst), 0)
    case B =>
      val e = g.objects.filter(col("kind") === "E")
      val fromDst = e.select(col("dst").as("o1"), col("id").as("o2"))
      val toSrc   = e.select(col("id").as("o1"), col("src").as("o2"))
      axisBand(fromDst.unionByName(toSrc), 0)
    case Nx =>
      if (hi == lo) idBand.filter(lit(false))
      else axisBand(g.objects.select(col("id").as("o1"), col("id").as("o2")), 1)
    case Pv =>
      if (hi == lo) idBand.filter(lit(false))
      else axisBand(g.objects.select(col("id").as("o1"), col("id").as("o2")), -1)
    case Concat(a, b)    => Band.compose(evalBands(a), evalBands(b))
    case Union(a, b)     => Band.union(evalBands(a), evalBands(b))
    case Repeat(p, n, m) => Repetition.range(evalBands(p), n, m, ops)
  })

  /** Band for a pair relation shifted by a constant delta within Ω. */
  private def axisBand(pairs: DataFrame, delta: Int): DataFrame =
    pairs.select(
      col("o1"),
      lit(math.max(lo, lo - delta)).as("l1"), lit(math.min(hi, hi - delta)).as("h1"),
      col("o2"),
      lit(math.max(lo, lo + delta)).as("l2"), lit(math.min(hi, hi + delta)).as("h2"),
      lit(delta).as("dl"), lit(delta).as("dh"))

  /** Step 3: the point-based relation `(o1, t1, o2, t2)`. */
  def evalPoints(path: Path): DataFrame = Band.toPoints(evalBands(path))
}
