package repro.jobs

import repro.core.{Kaskade, KHopConnectorView}
import repro.engine.Queries
import repro.experiments.ExperimentUtil
import repro.graph.{GraphGen, GraphSchema, GraphStats}

/** End-to-end demo of the Fig. 2 pipeline: profile the graph, enumerate and
  * select views under a budget, materialize, rewrite the blast-radius query,
  * and execute both plans.
  */
object ViewSelectionDemo {
  def main(args: Array[String]): Unit = {
    implicit val spark: org.apache.spark.sql.SparkSession = ExperimentUtil.session("kaskade-demo")
    try {
      val nJobs = args.headOption.map(_.toLong).getOrElse(512L)
      val g = GraphGen.provSummarized(spark, nJobs).cache()
      val kas = new Kaskade(GraphSchema.provSummarized, GraphStats.compute(g))
      val q = kas.parse(repro.experiments.ViewCatalog.blastRadiusCypher)

      println("== candidate views ==")
      kas.enumerate(q).foreach(v => println(s"  ${v.key}"))

      println("== selected under budget ==")
      val selected = kas.selectViews(Seq(q), budgetEdges = 10 * g.edgeCount)
      selected.foreach(s =>
        println(f"  ${s.view.key}  size=${s.size}%.0f  improvement=${s.improvement}%.1f"))

      val view = kas.materialize(KHopConnectorView("Job", "Job", 2), g)
      println(s"== materialized 2_HOP_JOB_TO_JOB: ${view.edgeCount} edges " +
        s"(graph has ${g.edgeCount}) ==")

      val rw = kas.rewrite(q).get
      println(s"== rewriting (paper Lst. 4) ==\n  ${rw.toCypher("q_j1", "q_j2")}")

      val (baseN, tBase) = ExperimentUtil.timeMs()(Queries.q1BlastRadius(g, "Job", 8).count())
      val (viewN, tView) =
        ExperimentUtil.timeMs()(Queries.q1BlastRadius(view, "Job", rw.hopsHi).count())
      println(f"== Q1 runtime: base $tBase%.0f ms ($baseN rows) vs view $tView%.0f ms " +
        f"($viewN rows), speedup ${tBase / tView}%.1fx ==")
    } finally spark.stop()
  }
}
