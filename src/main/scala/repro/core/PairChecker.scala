package repro.core

import scala.collection.mutable

import repro.tpg.Itpg
import Ast._

/** Driver-local ITPG snapshot for [[PairChecker]]. */
final case class LocalObject(
    id: Long,
    isNode: Boolean,
    label: String,
    src: Long, // -1 for nodes
    dst: Long,
    exist: Seq[(Int, Int)], // coalesced ξ intervals
    props: Map[String, Seq[(String, Int, Int)]] // p → coalesced (v, ts, te)
)

/** Algorithm 3 of the paper (`TupleEvalSolveOnlyPC`): a memoized,
  * polynomial-time membership check `(o1,t1,o2,t2) ∈ [[r]]_C` for the
  * NavL[PC] fragment (path conditions allowed, no numerical occurrence
  * indicators) over an interval-timestamped TPG held on the driver.
  *
  * Mirrors the paper's pruning: a concatenation only scans intermediate
  * time points within the temporal radius (number of N/P symbols) of both
  * endpoints.
  */
final class PairChecker(omegaLo: Int, omegaHi: Int, objects: Map[Long, LocalObject]) {

  private val memo = mutable.HashMap.empty[(Long, Int, Long, Int, Path), Boolean]
  private val objIds: Seq[Long] = objects.keys.toSeq.sorted

  /** Number of temporal axis symbols in `r` — the temporal radius bound. */
  private def temporalLen(p: Path): Int = p match {
    case Nx | Pv         => 1
    case F | B           => 0
    case Tst(t)          => testTemporalLen(t)
    case Concat(a, b)    => temporalLen(a) + temporalLen(b)
    case Union(a, b)     => math.max(temporalLen(a), temporalLen(b))
    case Repeat(_, _, _) => throw new UnsupportedOperationException(
      "PairChecker implements NavL[PC]: numerical occurrence indicators are not allowed")
  }

  // ?path can relocate only its own start, which stays put — radius 0.
  private def testTemporalLen(t: Test): Int = t match {
    case And(a, b) => math.max(testTemporalLen(a), testTemporalLen(b))
    case Or(a, b)  => math.max(testTemporalLen(a), testTemporalLen(b))
    case Not(x)    => testTemporalLen(x)
    case _         => 0
  }

  private def existsAt(o: LocalObject, t: Int): Boolean =
    o.exist.exists { case (a, b) => a <= t && t <= b }

  private def propAt(o: LocalObject, p: String, t: Int): Option[String] =
    o.props.getOrElse(p, Nil).collectFirst { case (v, a, b) if a <= t && t <= b => v }

  /** `(o,t) ⊨ test` (CheckTestNoPC extended with path conditions). */
  def checkTest(oid: Long, t: Int, test: Test): Boolean = {
    val o = objects(oid)
    test match {
      case IsNode       => o.isNode
      case IsEdge       => !o.isNode
      case HasLabel(l)  => o.label == l
      case PropIs(p, v) => propAt(o, p, t).contains(v)
      case Lt(k)        => t < k
      case Exists       => existsAt(o, t)
      case And(a, b)    => checkTest(oid, t, a) && checkTest(oid, t, b)
      case Or(a, b)     => checkTest(oid, t, a) || checkTest(oid, t, b)
      case Not(x)       => !checkTest(oid, t, x)
      case PathCond(p) =>
        val rad = temporalLen(p)
        objIds.exists { o2 =>
          ((t - rad) to (t + rad)).exists { t2 =>
            t2 >= omegaLo && t2 <= omegaHi && check(oid, t, o2, t2, p)
          }
        }
    }
  }

  /** `(o1,t1,o2,t2) ∈ [[r]]_C`. */
  def check(o1: Long, t1: Int, o2: Long, t2: Int, r: Path): Boolean = {
    val key = (o1, t1, o2, t2, r)
    memo.getOrElseUpdate(key, {
      val a = objects(o1)
      r match {
        case Nx => o1 == o2 && t2 == t1 + 1
        case Pv => o1 == o2 && t2 == t1 - 1
        case F =>
          t1 == t2 && ((!a.isNode && a.dst == o2) || (!objects(o2).isNode && objects(o2).src == o1))
        case B =>
          t1 == t2 && ((!a.isNode && a.src == o2) || (!objects(o2).isNode && objects(o2).dst == o1))
        case Tst(t) => o1 == o2 && t1 == t2 && checkTest(o1, t1, t)
        case Union(r1, r2) =>
          check(o1, t1, o2, t2, r1) || check(o1, t1, o2, t2, r2)
        case Concat(r1, r2) =>
          val l1 = temporalLen(r1)
          val l2 = temporalLen(r2)
          objIds.exists { om =>
            (omegaLo to omegaHi).exists { tm =>
              math.abs(tm - t1) <= l1 && math.abs(tm - t2) <= l2 &&
                check(o1, t1, om, tm, r1) && check(om, tm, o2, t2, r2)
            }
          }
        case Repeat(_, _, _) => throw new UnsupportedOperationException(
          "PairChecker implements NavL[PC]: numerical occurrence indicators are not allowed")
      }
    })
  }
}

object PairChecker {

  /** Collect an [[Itpg]] to the driver (small graphs only). */
  def fromItpg(g: Itpg): PairChecker =
    new PairChecker(g.omegaLo, g.omegaHi, collectObjects(g))

  /** Driver-side snapshot of all objects with coalesced ξ and σ. */
  def collectObjects(g: Itpg): Map[Long, LocalObject] = {
    val nodeRows = g.nodes.collect()
    val edgeRows = g.edges.collect()
    type Acc = (Boolean, String, Long, Long,
                mutable.ArrayBuffer[(Int, Int)],
                mutable.HashMap[String, mutable.ArrayBuffer[(String, Int, Int)]])
    val acc = mutable.HashMap.empty[Long, Acc]
    def add(id: Long, isNode: Boolean, label: String, src: Long, dst: Long,
            ts: Int, te: Int, props: Map[String, String]): Unit = {
      val a = acc.getOrElseUpdate(id,
        (isNode, label, src, dst, mutable.ArrayBuffer.empty, mutable.HashMap.empty))
      a._5 += ((ts, te))
      props.foreach { case (p, v) =>
        a._6.getOrElseUpdate(p, mutable.ArrayBuffer.empty) += ((v, ts, te))
      }
    }
    nodeRows.foreach { r =>
      add(r.getAs[Long]("id"), isNode = true, r.getAs[String]("label"), -1L, -1L,
          r.getAs[Int]("ts"), r.getAs[Int]("te"),
          Option(r.getAs[Map[String, String]]("props")).getOrElse(Map.empty))
    }
    edgeRows.foreach { r =>
      add(r.getAs[Long]("id"), isNode = false, r.getAs[String]("label"),
          r.getAs[Long]("src"), r.getAs[Long]("dst"),
          r.getAs[Int]("ts"), r.getAs[Int]("te"),
          Option(r.getAs[Map[String, String]]("props")).getOrElse(Map.empty))
    }
    def coalesceIv(iv: Seq[(Int, Int)]): Seq[(Int, Int)] =
      iv.sorted.foldLeft(List.empty[(Int, Int)]) {
        case ((a, b) :: rest, (c, d)) if c <= b + 1 => (a, math.max(b, d)) :: rest
        case (list, x)                              => x :: list
      }.reverse
    def coalesceVal(iv: Seq[(String, Int, Int)]): Seq[(String, Int, Int)] =
      iv.sortBy(x => (x._2, x._3)).foldLeft(List.empty[(String, Int, Int)]) {
        case ((v0, a, b) :: rest, (v, c, d)) if v == v0 && c <= b + 1 =>
          (v0, a, math.max(b, d)) :: rest
        case (list, x) => x :: list
      }.reverse
    acc.map { case (id, (isN, lab, s, d, iv, pr)) =>
      id -> LocalObject(id, isN, lab, s, d, coalesceIv(iv.toSeq),
                        pr.map { case (p, vs) => p -> coalesceVal(vs.toSeq) }.toMap)
    }.toMap
  }
}
