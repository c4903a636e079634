package repro.jobs

import repro.experiments.{ExperimentUtil, Fig5}

/** spark-submit entrypoint reproducing Fig. 5 (view size estimation). */
object Fig5SizeEstimation {
  def main(args: Array[String]): Unit = {
    val spark = ExperimentUtil.session("kaskade-fig5")
    try {
      println("== Fig. 5: estimated vs actual 2-hop connector sizes ==")
      println(Fig5.format(Fig5.run(spark)))
    } finally spark.stop()
  }
}
