package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench._

/** spark-submit entrypoints, one per reproduced table/section.
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [scale]
  * `scale` (default 1.0) scales the synthetic datasets (which are themselves
  * ~1/200 of the paper's graphs).
  */
object Jobs {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def scaleArg(args: Array[String]): Double =
    args.headOption.map(_.toDouble).getOrElse(1.0)
}

object Table2Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table2"); Table2Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Table3Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table3"); Table3Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Table4Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table4"); Table4Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Table5Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table5"); Table5Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Table6Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table6"); Table6Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Table7Job {
  def main(args: Array[String]): Unit = {
    val s = Jobs.session("table7"); Table7Runner.run(s, Jobs.scaleArg(args)); s.stop()
  }
}

object Section3Job {
  def main(args: Array[String]): Unit = { Section3Runner.run() }
}

object Section5Job {
  def main(args: Array[String]): Unit = { Section5Runner.run() }
}
