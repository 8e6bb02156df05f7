package repro.workloads

import org.apache.spark.sql.SparkSession
import repro.core.{GraphGen, GraphSpec, PropertyGraph}

/** The paper's datasets (Table 2), substituted by deterministic synthetic
  * graphs at ~1/200 scale with the original vertex:edge ratios / average
  * degrees. ``G(i, j)`` mirrors the paper's ``G_{i,j}`` labelling (i vertex
  * labels, j edge labels); the plain dataset (i = j = 1) is used by the
  * MagicRecs and money-flow experiments, which run on unlabelled graphs
  * with financial properties.
  *
  * `scale` further shrinks a dataset (tests use `scale = 0.1`).
  */
object Datasets {

  final case class DatasetDef(name: String, nV: Long, nE: Long) {
    def spec(nVLabels: Int = 1, nELabels: Int = 1, scale: Double = 1.0): GraphSpec =
      GraphSpec(
        name = if (nVLabels == 1 && nELabels == 1) name else s"${name}_{$nVLabels,$nELabels}",
        nVertices = math.max(16L, (nV * scale).toLong),
        nEdges = math.max(32L, (nE * scale).toLong),
        nVLabels = nVLabels,
        nELabels = nELabels,
        seed = 42L + name.hashCode % 1000,
      )

    def generate(spark: SparkSession, nVLabels: Int = 1, nELabels: Int = 1,
                 scale: Double = 1.0): PropertyGraph =
      GraphGen.generate(spark, spec(nVLabels, nELabels, scale)).cache()
  }

  /** Orkut: paper 3.0M vertices / 117.1M edges, avg degree 39.03. */
  val Ork = DatasetDef("Ork", 15000L, 585500L)
  /** LiveJournal: paper 4.8M / 68.5M, avg degree 14.27. */
  val LJ = DatasetDef("LJ", 24000L, 342500L)
  /** Wiki-topcats: paper 1.8M / 28.5M, avg degree 15.83. */
  val WT = DatasetDef("WT", 9000L, 142500L)
  /** BerkStan: paper 685K / 7.6M, avg degree 11.09. */
  val Brk = DatasetDef("Brk", 3425L, 38000L)

  val all: Seq[DatasetDef] = Seq(Ork, LJ, WT, Brk)
}
