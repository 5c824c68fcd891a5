package repro.core

import org.apache.spark.sql.DataFrame

/** Relation operations a repetition algorithm needs — implemented once for
  * point relations `(o1,t1,o2,t2)` and once for banded relations.
  */
trait RelOps {
  /** The identity relation (zero repetitions). */
  def id: DataFrame
  /** Relational composition. */
  def compose(a: DataFrame, b: DataFrame): DataFrame
  /** Set union (deduplicated). */
  def union(a: DataFrame, b: DataFrame): DataFrame
  /** Cut lineage / force computation at iteration boundaries. */
  def materialize(df: DataFrame): DataFrame
  /** Row count of a materialized relation. */
  def size(df: DataFrame): Long
}

/** Numerical-occurrence-indicator evaluation by exponentiation-by-squaring —
  * the paper's Algorithms 1 (ComputeRepetition) and 2
  * (ComputeIntervalRepetition), plus a squaring fixpoint for `[n,_]`.
  */
object Repetition {

  /** `R^n` — exactly n compositions (Algorithm 1). */
  def power(r: DataFrame, n: Int, ops: RelOps): DataFrame =
    if (n == 0) ops.id
    else if (n == 1) r
    else {
      val half = power(r, n / 2, ops)
      val sq = ops.compose(half, half)
      if (n % 2 == 0) sq else ops.compose(sq, r)
    }

  /** `R[0,m]` — at most m compositions (Algorithm 2). Exact: with
    * B(k) = R[0,k], B(2k) = B(k)∘B(k) and B(2k+1) = B(2k)∘B(1).
    */
  def upTo(r: DataFrame, m: Int, ops: RelOps): DataFrame =
    if (m == 0) ops.id
    else if (m == 1) ops.union(ops.id, r)
    else {
      val half = upTo(r, m / 2, ops)
      val sq = ops.compose(half, half)
      if (m % 2 == 0) sq else ops.compose(sq, ops.union(ops.id, r))
    }

  /** `R[0,_]` — reflexive-transitive closure by repeated squaring to a
    * fixpoint. Union only ever grows the row set, so an unchanged count is
    * an exact convergence test.
    */
  def closure(r: DataFrame, ops: RelOps, maxIter: Int = 64): DataFrame = {
    var s = ops.materialize(ops.union(ops.id, r))
    var n = ops.size(s)
    var iter = 0
    var done = false
    while (!done) {
      iter += 1
      require(iter <= maxIter, s"closure did not converge within $maxIter squarings")
      val s2 = ops.materialize(ops.union(s, ops.compose(s, s)))
      val n2 = ops.size(s2)
      if (n2 == n) done = true
      s = s2; n = n2
    }
    s
  }

  /** `R[n,m]` / `R[n,_]` (grammar (2)). */
  def range(r: DataFrame, min: Int, max: Option[Int], ops: RelOps): DataFrame = max match {
    case Some(m) if m == min => power(r, min, ops)
    case Some(m)             => ops.compose(power(r, min, ops), upTo(r, m - min, ops))
    case None if min == 0    => closure(r, ops)
    case None                => ops.compose(power(r, min, ops), closure(r, ops))
  }
}
