package repro.bench

import org.apache.spark.sql.SparkSession

/** Shared benchmark utilities: wall-clock timing and table formatting. */
object Bench {

  /** Session settings used by every bench: modest shuffle parallelism (AQE
    * coalesces further) and small in-memory columnar batches so cached-index
    * batch pruning operates at a granularity comparable to the paper's
    * per-list access. */
  def tune(spark: SparkSession): Unit = {
    spark.conf.set("spark.sql.shuffle.partitions", "16")
    spark.conf.set("spark.sql.autoBroadcastJoinThreshold", "-1")
  }

  /** Immediate progress line (stderr) so long runs show where they are. */
  def progress(msg: String): Unit = {
    Console.err.println(s"[bench] $msg")
    Console.err.flush()
  }

  def time[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val a  = f
    (a, (System.nanoTime() - t0) / 1e9)
  }

  def mb(bytes: Long): Double = bytes / 1e6

  def fmtSecs(s: Double): String = f"$s%.2f"

  def speedup(base: Double, x: Double): String = f"(${base / math.max(x, 1e-9)}%.2fx)"

  /** Render an aligned text table. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(r => if (i < r.size) r(i).length else 0).max)
    def line(r: Seq[String]) =
      r.zipWithIndex.map { case (c, i) => c.padTo(widths(i), ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (line(header) +: sep +: rows.map(line)).mkString("\n")
  }

  def banner(title: String): String =
    "\n" + "=" * 78 + s"\n$title\n" + "=" * 78
}
