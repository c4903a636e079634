package repro.experiments

import org.apache.spark.sql.SparkSession

/** Shared helpers for the table/figure reproduction harnesses. */
object ExperimentUtil {

  /** Wall-clock milliseconds of `body` (after a warm-up run when requested).
    * The action must itself force evaluation (count/collect).
    */
  def timeMs[A](warmups: Int = 0, runs: Int = 3)(body: => A): (A, Double) = {
    (1 to warmups).foreach(_ => body)
    var last: A = null.asInstanceOf[A]
    val times = (1 to runs).map { _ =>
      val t0 = System.nanoTime()
      last = body
      (System.nanoTime() - t0) / 1e6
    }
    (last, median(times))
  }

  def median(xs: Seq[Double]): Double = {
    val s = xs.sorted
    if (s.isEmpty) 0.0
    else if (s.size % 2 == 1) s(s.size / 2)
    else (s(s.size / 2 - 1) + s(s.size / 2)) / 2.0
  }

  /** Render rows as a fixed-width text table. */
  def table(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def fmt(r: Seq[String]): String =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (fmt(header) +: sep +: rows.map(fmt)).mkString("\n")
  }

  def fmtCount(x: Double): String =
    if (x >= 1e9) f"${x / 1e9}%.2fG"
    else if (x >= 1e6) f"${x / 1e6}%.2fM"
    else if (x >= 1e3) f"${x / 1e3}%.2fk"
    else f"$x%.1f"

  def fmtCount(x: Long): String = fmtCount(x.toDouble)

  /** Local SparkSession for job entrypoints (tests use SparkSpec instead). */
  def session(app: String): SparkSession = {
    val s = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.shuffle.partitions", sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
    s.sparkContext.setLogLevel("WARN")
    s
  }
}
