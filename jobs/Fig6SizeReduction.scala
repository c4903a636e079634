package repro.jobs

import repro.experiments.{ExperimentUtil, Fig6}

/** spark-submit entrypoint reproducing Fig. 6 (effective size reduction). */
object Fig6SizeReduction {
  def main(args: Array[String]): Unit = {
    val spark = ExperimentUtil.session("kaskade-fig6")
    try {
      println("== Fig. 6: effective graph size after summarizer and connector views ==")
      println(Fig6.format(Fig6.run(spark)))
    } finally spark.stop()
  }
}
