package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.engine.{GraphOps, Queries}
import repro.graph.GraphGen

/** Reproduction of Table IV: the query workload. Each query is executed at a
  * small scale over the provenance graph (raw plan and 2-hop-connector plan)
  * and classified by operation and result kind, as the paper's table does.
  */
object Table4 {

  final case class Row(
      query: String,
      operation: String,
      result: String,
      baseCardinality: Long,
      viewCardinality: Long,
  )

  def run(spark: SparkSession, nJobs: Long = 128): Seq[Row] = {
    val g = GraphGen.provSummarized(spark, nJobs).cache()
    val view = GraphOps.kHopConnector(g, 2, "Job", "Job", "2_HOP_JOB_TO_JOB").cache()

    val q1b = Queries.q1BlastRadius(g, "Job", 8).count()
    val q1v = Queries.q1BlastRadius(view, "Job", 4).count()
    val q2b = Queries.q2Ancestors(g, "Job", 4).count()
    val q2v = Queries.q2Ancestors(view, "Job", 2).count()
    val q3b = Queries.q3Descendants(g, "Job", 4).count()
    val q3v = Queries.q3Descendants(view, "Job", 2).count()
    val src = g.verticesOfType("Job").agg(org.apache.spark.sql.functions.min("id"))
      .collect()(0).getLong(0)
    val q4b = Queries.q4PathLengths(g, src, 4).count()
    val q4v = Queries.q4PathLengths(view, src, 2).count()
    val q5b = Queries.q5EdgeCount(g); val q5v = Queries.q5EdgeCount(view)
    val q6b = Queries.q6VertexCount(g); val q6v = Queries.q6VertexCount(view)
    val lb = Queries.q7CommunityDetection(g, 6); val lbN = lb.count()
    val lv = Queries.q7CommunityDetection(view, 3); val lvN = lv.count()
    val q8b = Queries.q8LargestCommunity(g, lb, "Job")
    val q8v = Queries.q8LargestCommunity(view, lv, "Job")

    val rows = Seq(
      Row("Q1: Job Blast Radius", "Retrieval", "Subgraph", q1b, q1v),
      Row("Q2: Ancestors", "Retrieval", "Set of vertices", q2b, q2v),
      Row("Q3: Descendants", "Retrieval", "Set of vertices", q3b, q3v),
      Row("Q4: Path lengths", "Retrieval", "Bag of scalars", q4b, q4v),
      Row("Q5: Edge Count", "Retrieval", "Single scalar", q5b, q5v),
      Row("Q6: Vertex Count", "Retrieval", "Single scalar", q6b, q6v),
      Row("Q7: Community Detection", "Update", "N/A", lbN, lvN),
      Row("Q8: Largest Community", "Retrieval", "Subgraph", q8b._2, q8v._2),
    )
    view.unpersist(); g.unpersist()
    rows
  }

  def format(rows: Seq[Row]): String = {
    import ExperimentUtil._
    table(
      Seq("Query", "Operation", "Result", "base plan card.", "view plan card."),
      rows.map(r => Seq(r.query, r.operation, r.result,
        r.baseCardinality.toString, r.viewCardinality.toString)))
  }
}
