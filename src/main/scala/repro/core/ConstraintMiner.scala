package repro.core

import repro.cypher.QueryGraph
import repro.graph.GraphSchema

/** Extracts *explicit* constraints (Prolog facts) from a query's graph
  * pattern and a graph schema (paper § IV-A1). The resulting fact program is
  * loaded into the inference engine together with the constraint-mining rules
  * ([[MiningRules]]) and view templates ([[ViewTemplates]]).
  */
object ConstraintMiner {

  /** Quote an identifier as a safe Prolog atom. */
  def atom(s: String): String =
    if (s.nonEmpty && s.head.isLower && s.forall(c => c.isLetterOrDigit || c == '_')) s
    else "'" + s.replace("'", "\\'") + "'"

  /** Facts for the query's MATCH pattern — mirrors the § IV-A1 listing for
    * the blast-radius query exactly (plus `queryVertexProjected/1` for the
    * RETURN clause, which § IV-B's enumeration relies on).
    */
  def queryFacts(q: QueryGraph): String = {
    val sb = new StringBuilder
    for (v <- q.vertexNames)
      sb.append(s"queryVertex(${atom(v)}).\n")
    for ((v, Some(label)) <- q.vertexLabels.toSeq.sortBy(_._1))
      sb.append(s"queryVertexType(${atom(v)}, ${atom(label)}).\n")
    for (e <- q.edges) {
      sb.append(s"queryEdge(${atom(e.src)}, ${atom(e.dst)}).\n")
      e.etype.foreach(t => sb.append(s"queryEdgeType(${atom(e.src)}, ${atom(e.dst)}, ${atom(t)}).\n"))
    }
    for (p <- q.varPaths)
      sb.append(s"queryVariableLengthPath(${atom(p.src)}, ${atom(p.dst)}, ${p.lo}, ${p.hi}).\n")
    for (r <- q.returns)
      sb.append(s"queryVertexProjected(${atom(r.variable)}).\n")
    sb.toString
  }

  /** Facts for the graph schema (vertex types and typed edges). */
  def schemaFacts(schema: GraphSchema): String = {
    val sb = new StringBuilder
    for (t <- schema.vertexTypes)
      sb.append(s"schemaVertex(${atom(t)}).\n")
    for (e <- schema.edges)
      sb.append(s"schemaEdge(${atom(e.srcType)}, ${atom(e.dstType)}, ${atom(e.etype)}).\n")
    sb.toString
  }

  /** The full explicit-constraint program for a (query, schema) pair. */
  def facts(q: QueryGraph, schema: GraphSchema): String =
    queryFacts(q) + schemaFacts(schema)
}
