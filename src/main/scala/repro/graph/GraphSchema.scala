package repro.graph

/** A typed edge in a graph schema: `srcType -[etype]-> dstType`. */
final case class SchemaEdge(srcType: String, dstType: String, etype: String)

/** The schema (vertex types + connectivity constraints) of a property graph
  * (paper § III-A). Schemas drive constraint mining: e.g. in the provenance
  * schema, jobs never connect to jobs directly, so only even-k job-to-job
  * connectors are feasible.
  */
final case class GraphSchema(vertexTypes: Seq[String], edges: Seq[SchemaEdge]) {
  require(edges.forall(e => vertexTypes.contains(e.srcType) && vertexTypes.contains(e.dstType)),
    "schema edge references unknown vertex type")

  def edgeTypes: Seq[String] = edges.map(_.etype).distinct

  /** Vertex types that are the source of at least one edge type (the
    * domain types `T_G` of estimator Eq. 3).
    */
  def sourceTypes: Seq[String] = edges.map(_.srcType).distinct

  def isHomogeneous: Boolean = vertexTypes.size == 1
}

object GraphSchema {

  /** Provenance graph schema — the paper's running example (§ I-A, Fig. 1),
    * raw form with tasks and machines.
    */
  val provRaw: GraphSchema = GraphSchema(
    vertexTypes = Seq("Job", "File", "Task", "Machine"),
    edges = Seq(
      SchemaEdge("Job", "File", "WRITES_TO"),
      SchemaEdge("File", "Job", "IS_READ_BY"),
      SchemaEdge("Job", "Task", "SPAWNS"),
      SchemaEdge("Task", "Task", "TRANSFERS_TO"),
      SchemaEdge("Task", "Machine", "RUNS_ON"),
    ))

  /** Summarized provenance schema: jobs and files only (§ VII-B). */
  val provSummarized: GraphSchema = GraphSchema(
    vertexTypes = Seq("Job", "File"),
    edges = Seq(
      SchemaEdge("Job", "File", "WRITES_TO"),
      SchemaEdge("File", "Job", "IS_READ_BY"),
    ))

  /** dblp-net schema: authors, publications, venues. */
  val dblpRaw: GraphSchema = GraphSchema(
    vertexTypes = Seq("Author", "Publication", "Venue"),
    edges = Seq(
      SchemaEdge("Author", "Publication", "WROTE"),
      SchemaEdge("Publication", "Author", "WRITTEN_BY"),
      SchemaEdge("Publication", "Venue", "PUBLISHED_IN"),
    ))

  /** Summarized dblp schema: authors and publications only. */
  val dblpSummarized: GraphSchema = GraphSchema(
    vertexTypes = Seq("Author", "Publication"),
    edges = Seq(
      SchemaEdge("Author", "Publication", "WROTE"),
      SchemaEdge("Publication", "Author", "WRITTEN_BY"),
    ))

  /** Homogeneous schema used by soc-livejournal and roadnet-usa. */
  def homogeneous(etype: String = "LINK"): GraphSchema =
    GraphSchema(Seq("Node"), Seq(SchemaEdge("Node", "Node", etype)))
}
