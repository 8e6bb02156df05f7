package repro.workloads

import repro.core.query._

/** The MagicRecs recommendation workload of §5.3.1 (Table 4, Figure 3).
  *
  * For a user a1, find the users a2..ak that a1 started following recently
  * (edge predicate ``time > T`` with 5 % selectivity, the paper's α) and
  * their common follower. MR1/MR2/MR3 use k = 2, 3, 4. MR2 and MR3 are
  * structurally cyclic (the common follower closes multiple edges), which
  * is why neighbour-ID-sorted default lists help the intersections while a
  * time-sorted vertex-bound index removes the per-edge time predicate
  * evaluations on a1's extensions.
  *
  * On the larger datasets the paper fixes a1 to a subset of vertices so MR3
  * finishes in reasonable time; we mirror that with an ``a1.ID < k`` anchor
  * passed by the caller (None = unrestricted).
  */
object MagicRecs {

  /** @param timeThreshold the recency cutoff T (α at 5 % selectivity means
    *        T = 0.95 · timeMax for uniform times) */
  def queries(timeThreshold: Double, a1Limit: Option[Long] = None): Seq[QueryGraph] = {
    val recent = Seq(EdgeScalarPred("time", Gt, timeThreshold))
    def a1 = QVertex("a1", idLt = a1Limit)

    val mr1 = QueryGraph("MR1",
      vertices = Seq(a1, QVertex("a2"), QVertex("b")),
      edges = Seq(
        QEdge("e1", "a1", "a2", scalarPreds = recent),
        QEdge("f1", "b", "a2")))

    val mr2 = QueryGraph("MR2",
      vertices = Seq(a1, QVertex("a2"), QVertex("a3"), QVertex("b")),
      edges = Seq(
        QEdge("e1", "a1", "a2", scalarPreds = recent),
        QEdge("e2", "a1", "a3", scalarPreds = recent),
        QEdge("f1", "b", "a2"),
        QEdge("f2", "b", "a3")))

    val mr3 = QueryGraph("MR3",
      vertices = Seq(a1, QVertex("a2"), QVertex("a3"), QVertex("a4"), QVertex("b")),
      edges = Seq(
        QEdge("e1", "a1", "a2", scalarPreds = recent),
        QEdge("e2", "a1", "a3", scalarPreds = recent),
        QEdge("e3", "a1", "a4", scalarPreds = recent),
        QEdge("f1", "b", "a2"),
        QEdge("f2", "b", "a3"),
        QEdge("f3", "b", "a4")))

    Seq(mr1, mr2, mr3)
  }
}
