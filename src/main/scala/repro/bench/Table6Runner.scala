package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core.SystemConfig
import repro.core.index.Catalogue
import repro.workloads.{Datasets, IndexConfigs, MoneyFlow}

/** Table 6 (§5.4): edge-bound index selectivity sweep on LJ — the 2-edge
  * MoneyFlow path with the α band at 25 %, 5 %, and 0.05 % selectivity,
  * under D vs D+EB. Runtime, memory, and |E_indexed| per selectivity.
  */
object Table6Runner {

  /** amt ∈ [1, 1000] uniform, so P(0 < Δamt < α) ≈ α/1000. */
  val selectivities: Seq[(String, Double)] =
    Seq("25%" -> 250.0, "5%" -> 50.0, "0.05%" -> 0.5)

  def run(spark: SparkSession, scale: Double = 1.0): String = {
    Bench.tune(spark)
    val sb = new StringBuilder
    sb ++= Bench.banner(s"Table 6: EB selectivity sweep on LJ (scale=$scale)")

    val g = Datasets.LJ.generate(spark, 1, 1, scale)
    val cat = Catalogue.build(g)
    sb ++= s"\n(|V|=${g.numVertices} |E|=${g.numEdges})\n"

    val header = Seq("selectivity", "D(s)", "D+EB(s)", "speedup",
                     "Mm D(MB)", "Mm D+EB(MB)", "|E_indexed|")
    val rows = selectivities.map { case (label, alpha) =>
      val q = MoneyFlow.twoEdgePath(alpha)
      val d = SystemConfig.build("D", g, IndexConfigs.D, cat, 8)
      d.count(q) // warm
      val (cD, tD) = Bench.time(d.count(q))
      val memD = d.memoryBytes
      d.unpersist()

      val eb = SystemConfig.build("D+EB", g,
        IndexConfigs.D :+ IndexConfigs.EBplain(alpha), cat, 8)
      eb.count(q)
      val (cEB, tEB) = Bench.time(eb.count(q))
      require(cD == cEB, s"$label: D=$cD D+EB=$cEB")
      val memEB = eb.memoryBytes
      val eIdx  = eb.edgesIndexed
      eb.unpersist()

      Seq(label, Bench.fmtSecs(tD), Bench.fmtSecs(tEB), Bench.speedup(tD, tEB),
          f"${Bench.mb(memD)}%.1f", f"${Bench.mb(memEB)}%.1f (${memEB.toDouble / memD}%.2fx)",
          eIdx.toString)
    }
    sb ++= Bench.table(header, rows)
    g.uncache()
    val out = sb.toString
    println(out)
    out
  }
}
