package repro.jobs

import repro.experiments.{ExperimentUtil, Table4}

/** spark-submit entrypoint reproducing Table IV (query workload catalog). */
object Table4Workload {
  def main(args: Array[String]): Unit = {
    val spark = ExperimentUtil.session("kaskade-table4")
    try {
      val nJobs = args.headOption.map(_.toLong).getOrElse(128L)
      println("== Table IV: query workload (executed over prov, base vs view plan) ==")
      println(Table4.format(Table4.run(spark, nJobs)))
    } finally spark.stop()
  }
}
