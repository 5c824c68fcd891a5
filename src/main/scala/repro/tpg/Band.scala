package repro.tpg

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Banded relations: the interval-based intermediate representation used by
  * the interval evaluator (paper Section VI, Steps 1–2, generalized).
  *
  * A *band* row `(o1, l1, h1, o2, l2, h2, dl, dh)` denotes the set of
  * temporal-object pairs
  *
  * {{{ {(o1,t1,o2,t2) | t1 ∈ [l1,h1], t2 ∈ [l2,h2], t2 − t1 ∈ [dl,dh]} }}}
  *
  * A banded relation (a DataFrame of such rows) denotes the union of its
  * bands. Bands are closed — and, crucially, *exact* — under the operations
  * needed for NavL[PC,NOI]: identity/tests, axes, composition, and union
  * (DESIGN.md §3 sketches the exactness argument for composition).
  */
object Band {

  /** Canonical column order of a banded relation. */
  val cols: Seq[String] = Seq("o1", "l1", "h1", "o2", "l2", "h2", "dl", "dh")

  /** Identity bands over per-object satisfaction intervals `(o, ts, te)` —
    * the banded form of a `test` (paper: `[[test]]_G` stays on the object).
    */
  def fromIntervals(iv: DataFrame): DataFrame =
    iv.select(col("id").as("o1"), col(Intervals.Ts).as("l1"), col(Intervals.Te).as("h1"),
              col("id").as("o2"), col(Intervals.Ts).as("l2"), col(Intervals.Te).as("h2"),
              lit(0).as("dl"), lit(0).as("dh"))

  /** Tighten a banded relation to path-consistent canonical form and drop
    * empty bands. One ordered pass (delta, start, end, delta) reaches the
    * fixpoint for this 2-variable difference constraint system.
    */
  def normalize(df: DataFrame): DataFrame =
    df.withColumn("dl", greatest(col("dl"), col("l2") - col("h1")))
      .withColumn("dh", least(col("dh"), col("h2") - col("l1")))
      .withColumn("l1", greatest(col("l1"), col("l2") - col("dh")))
      .withColumn("h1", least(col("h1"), col("h2") - col("dl")))
      .withColumn("l2", greatest(col("l2"), col("l1") + col("dl")))
      .withColumn("h2", least(col("h2"), col("h1") + col("dh")))
      .withColumn("dl", greatest(col("dl"), col("l2") - col("h1")))
      .withColumn("dh", least(col("dh"), col("h2") - col("l1")))
      .filter(col("l1") <= col("h1") && col("l2") <= col("h2") && col("dl") <= col("dh"))
      .select(cols.map(col): _*)

  /** Exact band composition: `{(o1,t1,o3,t3) | ∃(o2,t2): (o1,t1,o2,t2) ∈ a
    * and (o2,t2,o3,t3) ∈ b}`. Joins on the shared middle object with a
    * nonempty overlap of the middle time intervals, then applies the band
    * composition formula and normalizes.
    */
  def compose(a: DataFrame, b: DataFrame): DataFrame = {
    val l = a.select(cols.map(c => col(c).as("a_" + c)): _*)
    val r = b.select(cols.map(c => col(c).as("b_" + c)): _*)
    val j = l.join(r,
      l("a_o2") === r("b_o1") &&
        Intervals.overlaps(l("a_l2"), l("a_h2"), r("b_l1"), r("b_h1")))
    val u = greatest(col("a_l2"), col("b_l1"))
    val v = least(col("a_h2"), col("b_h1"))
    val out = j.select(
      col("a_o1").as("o1"),
      greatest(col("a_l1"), u - col("a_dh")).as("l1"),
      least(col("a_h1"), v - col("a_dl")).as("h1"),
      col("b_o2").as("o2"),
      greatest(col("b_l2"), u + col("b_dl")).as("l2"),
      least(col("b_h2"), v + col("b_dh")).as("h2"),
      (col("a_dl") + col("b_dl")).as("dl"),
      (col("a_dh") + col("b_dh")).as("dh"))
    normalize(out).distinct()
  }

  /** Band union (set of band rows; denotation is the union of the bands). */
  def union(a: DataFrame, b: DataFrame): DataFrame =
    a.select(cols.map(col): _*).unionByName(b.select(cols.map(col): _*)).distinct()

  /** Step 3: expand to the point-based relation `(o1, t1, o2, t2)`. */
  def toPoints(df: DataFrame): DataFrame =
    df.withColumn("t1", explode(sequence(col("l1"), col("h1"))))
      .withColumn("_lo", greatest(col("l2"), col("t1") + col("dl")))
      .withColumn("_hi", least(col("h2"), col("t1") + col("dh")))
      .filter(col("_lo") <= col("_hi"))
      .withColumn("t2", explode(sequence(col("_lo"), col("_hi"))))
      .select(col("o1"), col("t1"), col("o2"), col("t2"))
      .distinct()

  /** Start-side projection `(id, ts, te)` — the temporal objects from which
    * the relation is nonempty; used for `?path` tests. Tightening guarantees
    * every `t1 ∈ [l1,h1]` has a witness, so the projection is exact.
    */
  def startsOf(df: DataFrame): DataFrame =
    Intervals.coalesce(
      df.select(col("o1").as("id"), col("l1").as(Intervals.Ts), col("h1").as(Intervals.Te)),
      Seq("id"))

  /** Identity band over all given objects for the full domain `[lo, hi]`. */
  def identity(objectIds: DataFrame, lo: Int, hi: Int): DataFrame =
    objectIds.select(col("id").as("o1"), lit(lo).as("l1"), lit(hi).as("h1"),
                     col("id").as("o2"), lit(lo).as("l2"), lit(hi).as("h2"),
                     lit(0).as("dl"), lit(0).as("dh"))
}
