package repro.bench

import org.apache.spark.sql.SparkSession
import repro.baselines.{BinaryJoinEvaluator, FrontierEvaluator}
import repro.core.SystemConfig
import repro.core.index.Catalogue
import repro.workloads.{Datasets, IndexConfigs, SubgraphQueries}

/** Table 7 (§5.6): GraphflowDB (our engine, D_p configuration) vs the
  * TigerGraph-like frontier engine vs the Neo4j-like binary-join engine on
  * SQ1, SQ2, SQ3 and SQ13 over LJ_{12,2} and WT_{4,2}.
  */
object Table7Runner {

  final case class Setting(ds: Datasets.DatasetDef, nVL: Int, nEL: Int)
  val settings: Seq[Setting] = Seq(Setting(Datasets.LJ, 12, 2), Setting(Datasets.WT, 4, 2))
  val queryNames: Seq[String] = Seq("SQ1", "SQ2", "SQ3", "SQ13")

  def run(spark: SparkSession, scale: Double = 1.0): String = {
    Bench.tune(spark)
    val sb = new StringBuilder
    sb ++= Bench.banner(s"Table 7: GF(D_p) vs TigerGraph-like vs Neo4j-like (scale=$scale)")

    for (s <- settings) {
      val g = s.ds.generate(spark, s.nVL, s.nEL, scale)
      val cat = Catalogue.build(g)
      val queries = queryNames.map(SubgraphQueries.byName(s.nVL, s.nEL, _))
      sb ++= s"\n\n--- ${s.ds.name}_{${s.nVL},${s.nEL}}  (|V|=${g.numVertices} |E|=${g.numEdges}) ---\n"

      val gf = SystemConfig.build("GF", g, IndexConfigs.Dp, cat, 8)
      val n4 = new BinaryJoinEvaluator(g, cat)
      gf.count(queries.head); n4.count(queries.head) // warm both engines

      var counts = Map.empty[String, Long]
      var gfT    = Map.empty[String, Double]

      val gfRow = "GF (D_p)" +: queries.map { q =>
        val (c, t) = Bench.time(gf.count(q))
        counts += q.name -> c; gfT += q.name -> t
        Bench.fmtSecs(t)
      }
      val tgRow = "TG-like" +: queries.map { q =>
        val (c, t) = Bench.time(FrontierEvaluator.count(g, q))
        require(c == counts(q.name), s"${q.name}: TG=$c GF=${counts(q.name)}")
        s"${Bench.fmtSecs(t)} ${Bench.speedup(t, gfT(q.name))}"
      }
      val n4Row = "N4-like" +: queries.map { q =>
        val (c, t) = Bench.time(n4.count(q))
        require(c == counts(q.name), s"${q.name}: N4=$c GF=${counts(q.name)}")
        s"${Bench.fmtSecs(t)} ${Bench.speedup(t, gfT(q.name))}"
      }
      sb ++= Bench.table("system" +: queryNames, Seq(gfRow, tgRow, n4Row))
      sb ++= "\n(parenthesised factor = system time / GF time, i.e. slowdown vs GF, as in the paper)"
      sb ++= "\ncounts: " + queries.map(q => s"${q.name}=${counts(q.name)}").mkString(" ")
      gf.unpersist(); n4.unpersist()
      g.uncache()
    }
    val out = sb.toString
    println(out)
    out
  }
}
