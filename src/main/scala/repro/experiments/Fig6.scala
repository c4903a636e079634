package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.engine.GraphOps
import repro.graph.{GraphGen, PropertyGraph}

/** Reproduction of Fig. 6 (as a table): effective graph size (vertices +
  * edges) of the raw graph, after the schema-level summarizer, and after the
  * 2-hop connector, for the two heterogeneous networks.
  */
object Fig6 {

  final case class Row(dataset: String, stage: String, vertices: Long, edges: Long) {
    def effectiveSize: Long = vertices + edges
  }

  private def stages(
      name: String,
      raw: PropertyGraph,
      keepTypes: Seq[String],
      connectorType: String,
      label: String,
  ): Seq[Row] = {
    val cachedRaw = raw.cache()
    val summarized = GraphOps.vertexInclusionSummarizer(cachedRaw, keepTypes).cache()
    val connector = GraphOps.kHopConnector(summarized, 2, connectorType, connectorType, label).cache()
    val rows = Seq(
      Row(name, "raw", cachedRaw.vertexCount, cachedRaw.edgeCount),
      Row(name, "summarizer", summarized.vertexCount, summarized.edgeCount),
      Row(name, "2-hop connector", connector.vertexCount, connector.edgeCount))
    Seq(cachedRaw, summarized, connector).foreach(_.unpersist())
    rows
  }

  def run(
      spark: SparkSession,
      provJobs: Long = 256,
      provTasksPerJob: Int = 2000,
      dblpAuthors: Long = 20000,
  ): Seq[Row] =
    // Production-like funnel: each job writes many files, all consumed by a
    // small successor set — this is what gives the connector its own
    // order-of-magnitude reduction on top of the summarizer (§ VII-E).
    stages("prov",
      GraphGen.provRaw(spark, provJobs, tasksPerJob = provTasksPerJob,
        fanOut = 24, readers = 4, crossFrac = 0.02),
      keepTypes = Seq("Job", "File"), connectorType = "Job", label = "2_HOP_JOB_TO_JOB") ++
      stages("dblp",
        GraphGen.dblp(spark, dblpAuthors, includeVenues = true),
        keepTypes = Seq("Author", "Publication"), connectorType = "Author",
        label = "2_HOP_AUTHOR_TO_AUTHOR")

  def format(rows: Seq[Row]): String = {
    import ExperimentUtil._
    val base = rows.groupBy(_.dataset).view.mapValues(_.head.effectiveSize.toDouble).toMap
    table(
      Seq("dataset", "stage", "|V|", "|E|", "effective size", "reduction vs raw"),
      rows.map(r => Seq(
        r.dataset, r.stage, fmtCount(r.vertices), fmtCount(r.edges),
        fmtCount(r.effectiveSize),
        f"${base(r.dataset) / math.max(1.0, r.effectiveSize.toDouble)}%.1fx")))
  }
}
