package repro.core.plan

import repro.core.index.{APlusIndex, Direction, Fwd, Bwd}
import repro.core.query.{QEdge, QueryGraph}

/** What an adjacency-list access is bound to (§2): a matched vertex variable
  * (default / vertex-bound indexes) or a matched edge variable (edge-bound). */
sealed trait Bound
final case class VBound(v: String) extends Bound
final case class EBound(edgeVar: String) extends Bound

/** One adjacency-list access: match query edge `qe` through `index`. */
final case class Access(qe: QEdge, index: APlusIndex, bound: Bound) {
  /** Extension direction (meaningful for vertex-bound accesses). */
  def dir: Direction = bound match {
    case VBound(v) => if (qe.from == v) Fwd else Bwd
    case EBound(_) =>
      if (index.defn.kind.asInstanceOf[repro.core.index.EdgeBoundKind].shape.adjOutgoing) Fwd
      else Bwd
  }
  /** The query vertex this access reaches (the neighbour side). */
  def reaches: String = bound match {
    case VBound(v) => if (qe.from == v) qe.to else qe.from
    case EBound(_) => if (dir == Fwd) qe.to else qe.from
  }
}

sealed trait PlanOp
/** Scan the vertex table and bind variable `v` (with its local predicates). */
final case class ScanOp(v: String) extends PlanOp
/** EXTEND/INTERSECT: extend partial matches by `newV`, matching every query
  * edge between `newV` and the matched set — a z-way intersection when
  * `accesses.size > 1` (§4.1). */
final case class ExtendOp(newV: String, accesses: Seq[Access]) extends PlanOp {
  require(accesses.nonEmpty && accesses.forall(_.reaches == newV))
}
/** MULTI-EXTEND: intersect z ≥ 2 lists sorted on a non-ID property `prop`
  * and extend by one new query vertex per list at once (§4.1). */
final case class MultiExtendOp(prop: String, units: Seq[(String, Access)]) extends PlanOp {
  require(units.size >= 2 && units.forall { case (v, a) => a.reaches == v })
}

/** A physical plan: operator sequence over a query, produced by the DP
  * optimizer and compiled to a DataFrame by the Executor. */
final case class Plan(q: QueryGraph, ops: Seq[PlanOp], estCost: Double) {
  def describe: String = ops.map {
    case ScanOp(v) => s"SCAN($v)"
    case ExtendOp(v, as) =>
      s"E/I($v via ${as.map(a => s"${a.qe.name}:${a.index.name}@${a.bound}").mkString(", ")})"
    case MultiExtendOp(p, us) =>
      s"MULTI-EXTEND[$p](${us.map { case (v, a) => s"$v via ${a.qe.name}:${a.index.name}@${a.bound}" }.mkString("; ")})"
  }.mkString(" -> ")
}
