package repro.workloads

import repro.core.query._

/** The labelled subgraph query workload of §5.2 (Table 3).
  *
  * The paper takes the 14 queries of reference [32] (not printed in the
  * paper) and fixes both vertex and edge labels. We define 13 structurally
  * analogous queries — acyclic and cyclic, sparse and dense, 2–6 query
  * vertices, SQ13 a long 5-edge path (as §5.6 states) — and assign labels
  * deterministically from the dataset's label counts. SQ14 is omitted, as
  * in the paper (it returned too few tuples).
  */
object SubgraphQueries {

  /** Shapes as (vertexCount, edge list over 1-based vertex positions). */
  private val shapes: Seq[(String, Int, Seq[(Int, Int)])] = Seq(
    ("SQ1", 3, Seq(1 -> 2, 2 -> 3)),                                     // 2-path
    ("SQ2", 4, Seq(1 -> 2, 2 -> 3, 3 -> 4)),                             // 3-path
    ("SQ3", 4, Seq(1 -> 2, 1 -> 3, 1 -> 4)),                             // out-star
    ("SQ4", 3, Seq(1 -> 2, 2 -> 3, 1 -> 3)),                             // triangle
    ("SQ5", 4, Seq(1 -> 2, 2 -> 3, 1 -> 3, 3 -> 4)),                     // tailed triangle
    ("SQ6", 4, Seq(1 -> 2, 2 -> 3, 3 -> 4, 4 -> 1)),                     // directed 4-cycle
    ("SQ7", 4, Seq(1 -> 2, 2 -> 3, 3 -> 4, 4 -> 1, 1 -> 3)),             // diamond
    ("SQ8", 4, Seq(1 -> 2, 1 -> 3, 1 -> 4, 2 -> 3, 2 -> 4, 3 -> 4)),     // 4-clique
    ("SQ9", 5, Seq(1 -> 2, 2 -> 3, 3 -> 4, 4 -> 1, 1 -> 5, 2 -> 5)),     // house
    ("SQ10", 5, Seq(1 -> 2, 2 -> 3, 1 -> 3, 3 -> 4, 4 -> 5, 3 -> 5)),    // bowtie
    ("SQ11", 5, Seq(1 -> 2, 1 -> 3, 1 -> 4, 1 -> 5, 2 -> 3, 2 -> 4,
                    2 -> 5, 3 -> 4, 3 -> 5, 4 -> 5)),                    // 5-clique
    ("SQ12", 6, Seq(1 -> 2, 2 -> 3, 1 -> 3, 1 -> 4, 2 -> 5, 3 -> 6)),    // triangle w/ pendants
    ("SQ13", 6, Seq(1 -> 2, 2 -> 3, 3 -> 4, 4 -> 5, 5 -> 6)),            // 5-edge path
  )

  /** Deterministic label choice: query qi, vertex position j gets vertex
    * label ((qi + j) mod nVLabels) + 1; edge position k gets edge label
    * ((qi + k) mod nELabels) + 1. */
  def forLabels(nVLabels: Int, nELabels: Int): Seq[QueryGraph] =
    shapes.zipWithIndex.map { case ((name, nv, es), qi) =>
      QueryGraph(
        name,
        vertices = (1 to nv).map(j =>
          QVertex(s"a$j", label = Some((qi + j) % nVLabels + 1))),
        edges = es.zipWithIndex.map { case ((f, t), k) =>
          QEdge(s"e${k + 1}", s"a$f", s"a$t", label = Some((qi + k) % nELabels + 1))
        },
      )
    }

  def byName(nVLabels: Int, nELabels: Int, name: String): QueryGraph =
    forLabels(nVLabels, nELabels).find(_.name == name).get
}
