package repro.core.query

/** Comparison operators shared by query predicates and index-view predicates. */
sealed trait CmpOp { def sql: String }
case object Lt extends CmpOp { val sql = "<"  }
case object Le extends CmpOp { val sql = "<=" }
case object Gt extends CmpOp { val sql = ">"  }
case object Ge extends CmpOp { val sql = ">=" }
case object EqOp extends CmpOp { val sql = "=" }

/** A query vertex with its local (single-variable) constraints. */
final case class QVertex(
    name: String,
    label: Option[Int] = None,
    /** Equality constraints on categorical vertex properties, e.g. acc -> 1 (CQ). */
    propEq: Map[String, Int] = Map.empty,
    idEq: Option[Long] = None,
    /** ``a.ID < k`` anchors used by the paper's MF3/MF5 queries. */
    idLt: Option[Long] = None,
)

/** A scalar predicate on one edge property, e.g. ``time > 950000``. */
final case class EdgeScalarPred(prop: String, op: CmpOp, value: Double)

/** A directed query edge ``from -[name]-> to`` with local constraints. */
final case class QEdge(
    name: String,
    from: String,
    to: String,
    label: Option[Int] = None,
    scalarPreds: Seq[EdgeScalarPred] = Nil,
    idEq: Option[Long] = None,
)

/** Property equality across ≥ 2 query vertices: ``a2.city = a4.city = ...``. */
final case class VertexEqPred(prop: String, vars: Seq[String]) {
  require(vars.size >= 2, s"VertexEqPred needs >=2 vars, got $vars")
}

/** A cross-edge predicate ``e1.p1 OP e2.p2 + delta`` (the money-flow form). */
final case class EdgePairPred(
    e1: String, p1: String, op: CmpOp, e2: String, p2: String, delta: Double = 0.0)

/** A subgraph query: the join component of an openCypher MATCH/WHERE.
  *
  * Matching semantics are homomorphisms (no distinctness constraints),
  * applied uniformly across the engine, ground truth, and baselines.
  */
final case class QueryGraph(
    name: String,
    vertices: Seq[QVertex],
    edges: Seq[QEdge],
    vertexEqs: Seq[VertexEqPred] = Nil,
    edgePairs: Seq[EdgePairPred] = Nil,
) {
  require(vertices.nonEmpty, s"$name: no query vertices")
  require(vertices.map(_.name).distinct.size == vertices.size, s"$name: duplicate vertex names")
  require(edges.map(_.name).distinct.size == edges.size, s"$name: duplicate edge names")
  private val vNames = vertices.map(_.name).toSet
  edges.foreach { e =>
    require(vNames(e.from) && vNames(e.to), s"$name: edge ${e.name} references unknown vertex")
    require(e.from != e.to, s"$name: self-loop query edges unsupported (${e.name})")
  }
  vertexEqs.foreach(p => p.vars.foreach(v => require(vNames(v), s"$name: vertexEq on unknown $v")))
  private val eNames = edges.map(_.name).toSet
  edgePairs.foreach { p =>
    require(eNames(p.e1) && eNames(p.e2), s"$name: edgePair on unknown edge")
  }

  def vertex(n: String): QVertex = vertices.find(_.name == n).get
  def edge(n: String): QEdge     = edges.find(_.name == n).get

  /** Query edges incident to vertex variable `v`. */
  def edgesOf(v: String): Seq[QEdge] = edges.filter(e => e.from == v || e.to == v)

  /** Query edges connecting `v` to any vertex in `s` (v excluded from s). */
  def connecting(v: String, s: Set[String]): Seq[QEdge] =
    edges.filter(e =>
      (e.from == v && s(e.to)) || (e.to == v && s(e.from)))

  /** Vertex variables adjacent to the set `s` but not in it. */
  def frontier(s: Set[String]): Seq[String] =
    vertices.map(_.name).filterNot(s).filter(v => connecting(v, s).nonEmpty)

  /** Cross-edge predicates relating exactly the pair (a, b), in either order. */
  def pairsBetween(a: String, b: String): Seq[EdgePairPred] =
    edgePairs.filter(p => (p.e1 == a && p.e2 == b) || (p.e1 == b && p.e2 == a))

  def isConnected: Boolean = {
    if (vertices.size == 1) return true
    var seen = Set(vertices.head.name)
    var grew = true
    while (grew) {
      val next = frontier(seen).toSet
      grew = next.nonEmpty
      seen ++= next
    }
    seen.size == vertices.size
  }
}
