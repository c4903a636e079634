package repro.core

/** A candidate graph view produced by view enumeration (§ IV-B): an
  * instantiation of a view template, translatable to the Cypher query that
  * materializes it (§ V-B).
  */
sealed trait CandidateView {

  /** Stable identity for deduplication and selection. */
  def key: String

  /** Cypher query that materializes this view (as Kaskade's workload
    * analyzer would submit to the execution engine).
    */
  def toCypher: String
}

/** Contraction of k-hop paths between two vertex types (Table I, row 2;
  * Fig. 3). `label` is the contracted edge type, e.g. `2_HOP_JOB_TO_JOB`
  * as in the paper's Lst. 4.
  */
final case class KHopConnectorView(srcType: String, dstType: String, k: Int) extends CandidateView {
  def label: String = s"${k}_HOP_${srcType.toUpperCase}_TO_${dstType.toUpperCase}"
  def sameVertexType: Boolean = srcType == dstType
  override def key: String = s"kHopConnector($srcType,$dstType,$k)"
  override def toCypher: String =
    s"MATCH (x:$srcType)-[p*$k..$k]->(y:$dstType) " +
      s"RETURN x, y, max(p.ts) AS ts // CREATE (x)-[:$label]->(y)"
}

/** Variable-length same-vertex-type connector (Table I, row 1). */
final case class SameVertexTypeConnectorView(vtype: String, maxHops: Int = 8) extends CandidateView {
  override def key: String = s"connectorSameVertexType($vtype)"
  override def toCypher: String =
    s"MATCH (x:$vtype)-[p*1..$maxHops]->(y:$vtype) RETURN x, y " +
      s"// CREATE (x)-[:${vtype.toUpperCase}_TO_${vtype.toUpperCase}]->(y)"
}

/** Source-to-sink connector (Table I, row 4). */
final case class SourceToSinkConnectorView(srcType: String, dstType: String) extends CandidateView {
  override def key: String = s"sourceToSinkConnector($srcType,$dstType)"
  override def toCypher: String =
    s"MATCH (x:$srcType)-[p*]->(y:$dstType) WHERE NOT ()-->(x) AND NOT (y)-->() " +
      "RETURN x, y // CREATE (x)-[:SOURCE_TO_SINK]->(y)"
}

/** Connector over paths of a single edge type (Table I, row 3). */
final case class SameEdgeTypeConnectorView(srcType: String, dstType: String, etype: String)
    extends CandidateView {
  override def key: String = s"sameEdgeTypeConnector($srcType,$dstType,$etype)"
  override def toCypher: String =
    s"MATCH (x:$srcType)-[:$etype*]->(y:$dstType) RETURN x, y " +
      s"// CREATE (x)-[:VIA_${etype}]->(y)"
}

/** Keep only the listed vertex types (and induced edges) — the schema-level
  * summarizer of § VII-E (Table II, row 3).
  */
final case class VertexInclusionSummarizerView(vtypes: Seq[String]) extends CandidateView {
  override def key: String = s"summarizerVertexInclusion(${vtypes.sorted.mkString(",")})"
  override def toCypher: String =
    s"MATCH (x) WHERE ${vtypes.map(t => s"x:$t").mkString(" OR ")} RETURN x // plus induced edges"
}

/** Keep only the listed edge types (Table II, row 4). */
final case class EdgeInclusionSummarizerView(etypes: Seq[String]) extends CandidateView {
  override def key: String = s"summarizerEdgeInclusion(${etypes.sorted.mkString(",")})"
  override def toCypher: String =
    s"MATCH (x)-[e]->(y) WHERE ${etypes.map(t => s"e:$t").mkString(" OR ")} RETURN x, e, y"
}

/** Remove one vertex type and its incident edges (Table II, row 1). */
final case class VertexRemovalSummarizerView(vtype: String) extends CandidateView {
  override def key: String = s"summarizerRemoveVertices($vtype)"
  override def toCypher: String = s"MATCH (x) WHERE NOT x:$vtype RETURN x // plus induced edges"
}

/** Remove one edge type (Table II, row 2). */
final case class EdgeRemovalSummarizerView(etype: String) extends CandidateView {
  override def key: String = s"summarizerRemoveEdges($etype)"
  override def toCypher: String = s"MATCH (x)-[e]->(y) WHERE NOT e:$etype RETURN x, e, y"
}
