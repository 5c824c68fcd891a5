package repro.tpg

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

/** DataFrame-level algebra over sets of integer intervals.
  *
  * An "interval relation" is a DataFrame with arbitrary key columns plus two
  * integer columns `ts`, `te` (inclusive bounds, `ts <= te`). A relation is
  * *coalesced* (Böhlen et al. [43] in the paper) when, per key, no two
  * intervals overlap or are adjacent — the canonical form required by the
  * ITPG definition (Appendix A) and maintained by every operation here.
  */
object Intervals {

  /** Column names of the interval bounds used throughout the repo. */
  val Ts = "ts"
  val Te = "te"

  /** Coalesce per `keys`: merge overlapping and adjacent intervals into
    * maximal ones. Standard gaps-and-islands with a running-max window.
    */
  def coalesce(df: DataFrame, keys: Seq[String]): DataFrame = {
    val w = Window.partitionBy(keys.map(col): _*).orderBy(col(Ts), col(Te))
    val prevMax = max(col(Te)).over(w.rowsBetween(Window.unboundedPreceding, -1))
    df.withColumn("_pm", prevMax)
      .withColumn("_new", when(col("_pm").isNull || col(Ts) > col("_pm") + 1, 1).otherwise(0))
      .withColumn("_grp", sum(col("_new")).over(w))
      .groupBy((keys :+ "_grp").map(col): _*)
      .agg(min(Ts).as(Ts), max(Te).as(Te))
      .drop("_grp")
  }

  /** Per-key intersection of two *coalesced* relations (same key columns).
    * The result is coalesced (pieces of two coalesced families cannot touch).
    */
  def intersect(a: DataFrame, b: DataFrame, keys: Seq[String]): DataFrame = {
    val bn = b.withColumnRenamed(Ts, "_bts").withColumnRenamed(Te, "_bte")
    a.join(bn, keys)
      .filter(col(Ts) <= col("_bte") && col("_bts") <= col(Te))
      .withColumn(Ts, greatest(col(Ts), col("_bts")))
      .withColumn(Te, least(col(Te), col("_bte")))
      .drop("_bts", "_bte")
  }

  /** Per-key union of two relations; result is coalesced. */
  def union(a: DataFrame, b: DataFrame, keys: Seq[String]): DataFrame =
    coalesce(a.select((keys :+ Ts :+ Te).map(col): _*)
               .unionByName(b.select((keys :+ Ts :+ Te).map(col): _*)), keys)

  /** Per-key complement of a *coalesced* relation within `[lo, hi]`.
    *
    * `universe` enumerates the keys over which the complement is taken (one
    * row per key combination); keys absent from `df` map to the full range.
    * Intervals of `df` are assumed to lie within `[lo, hi]`.
    */
  def complement(df: DataFrame, universe: DataFrame, keys: Seq[String],
                 lo: Int, hi: Int): DataFrame = {
    val u = universe.select(keys.map(col): _*).distinct()
    val d = df.select((keys :+ Ts :+ Te).map(col): _*)
    val w = Window.partitionBy(keys.map(col): _*).orderBy(col(Ts))
    // Gap before each interval (using the previous interval's end, or lo-1).
    val gaps = d
      .withColumn("_pe", lag(col(Te), 1).over(w))
      .select(keys.map(col) :+
        (org.apache.spark.sql.functions.coalesce(col("_pe") + 1, lit(lo)).as(Ts)) :+
        ((col(Ts) - 1).as(Te)): _*)
    // Tail gap after the last interval of each key.
    val tails = d.groupBy(keys.map(col): _*).agg(max(Te).as("_me"))
      .select(keys.map(col) :+ ((col("_me") + 1).as(Ts)) :+ lit(hi).as(Te): _*)
    // Keys with no interval at all: the full range.
    val absent = u.join(d.select(keys.map(col): _*).distinct(), keys, "left_anti")
      .select(keys.map(col) :+ lit(lo).as(Ts) :+ lit(hi).as(Te): _*)
    gaps.unionByName(tails).unionByName(absent).filter(col(Ts) <= col(Te))
  }

  /** Expand every interval into its time points (column `t`). */
  def points(df: DataFrame, keys: Seq[String]): DataFrame =
    df.select(keys.map(col) :+ explode(sequence(col(Ts), col(Te))).as("t"): _*)

  /** Overlap predicate on raw columns — handy in join conditions. */
  def overlaps(ts1: Column, te1: Column, ts2: Column, te2: Column): Column =
    ts1 <= te2 && ts2 <= te1
}
