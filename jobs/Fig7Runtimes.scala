package repro.jobs

import repro.experiments.{ExperimentUtil, Fig7}

/** spark-submit entrypoint reproducing Fig. 7 (query runtimes, base vs 2-hop
  * connector view, per dataset).
  */
object Fig7Runtimes {
  def main(args: Array[String]): Unit = {
    val spark = ExperimentUtil.session("kaskade-fig7")
    try {
      val runs = args.headOption.map(_.toInt).getOrElse(1)
      println("== Fig. 7: query runtimes over base graph vs 2-hop connector view ==")
      println(Fig7.format(Fig7.run(spark, runs)))
    } finally spark.stop()
  }
}
