package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}
import repro.SparkSpec

/** One bench suite per evaluation table / prose experiment. Each prints the
  * paper-style table and persists it under bench_results/ for EXPERIMENTS.md.
  *
  * BENCH_SCALE (default 1.0) scales the synthetic datasets, which are
  * themselves ~1/200 of the paper's graphs.
  */
trait BenchBase extends SparkSpec {
  def scale: Double = sys.env.get("BENCH_SCALE").map(_.toDouble).getOrElse(1.0)

  def save(name: String, content: String): Unit = {
    val dir = Paths.get("bench_results")
    if (!Files.exists(dir)) Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), content.getBytes("UTF-8"),
      StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }
}

class Table2DatasetStats extends BenchBase {
  test("Table 2: dataset statistics") {
    save("table2", Table2Runner.run(spark, scale))
  }
}

class Table3ReconfigBench extends BenchBase {
  test("Table 3: D vs D_s vs D_p on SQ1-SQ13") {
    save("table3", Table3Runner.run(spark, scale))
  }
}

class Table4MagicRecsBench extends BenchBase {
  test("Table 4: MagicRecs under D vs D+VB_t") {
    save("table4", Table4Runner.run(spark, scale))
  }
}

class Table5FraudBench extends BenchBase {
  test("Table 5: MoneyFlow under D / D+VB_c / D+VB_c+EB_c") {
    save("table5", Table5Runner.run(spark, scale))
  }
}

class Table6SelectivityBench extends BenchBase {
  test("Table 6: EB selectivity sweep") {
    save("table6", Table6Runner.run(spark, scale))
  }
}

class Table7SystemsBench extends BenchBase {
  test("Table 7: GF vs TigerGraph-like vs Neo4j-like") {
    save("table7", Table7Runner.run(spark, scale))
  }
}

class Section3IndirectionBench extends BenchBase {
  test("Section 3: sequential vs list-level vs graph-level indirection") {
    save("section3", Section3Runner.run())
  }
}

class Section55MaintenanceBench extends BenchBase {
  test("Section 5.5: maintenance throughput under 5 configurations") {
    save("section55", Section5Runner.run())
  }
}
