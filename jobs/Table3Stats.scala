package repro.jobs

import repro.experiments.{ExperimentUtil, Table3}

/** spark-submit entrypoint reproducing Table III (dataset sizes).
  *
  * Usage: spark-submit --class repro.jobs.Table3Stats repro.jar [nJobs]
  */
object Table3Stats {
  def main(args: Array[String]): Unit = {
    val spark = ExperimentUtil.session("kaskade-table3")
    try {
      val nJobs = args.headOption.map(_.toLong).getOrElse(256L)
      val rows = Table3.run(spark, nJobs = nJobs)
      println("== Table III: networks used for evaluation (scaled reproduction) ==")
      println(Table3.format(rows))
    } finally spark.stop()
  }
}
