package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.cypher.CypherParser
import repro.graph.GraphSchema
import repro.prolog.{Num, Solver}

/** Exercises the constraint-mining rule library (§ IV-A2) against the
  * paper's provenance schema and blast-radius query.
  */
class MiningRulesSpec extends AnyFunSuite {

  private val blastRadius = CypherParser.parse(
    """MATCH (q_j1:Job) -[:WRITES_TO]-> (q_f1:File),
      |      (q_f1:File) -[r*0..8]-> (q_f2:File),
      |      (q_f2:File) -[:IS_READ_BY]-> (q_j2:Job)
      |RETURN q_j1 as A, q_j2 as B""".stripMargin)

  private def solver(schema: GraphSchema = GraphSchema.provSummarized): Solver =
    new Solver(ViewEnumerator.buildDatabase(blastRadius, schema))

  // ---- schema rules --------------------------------------------------------

  test("schemaKHopPath: 1-hop paths match schema edges") {
    val s = solver()
    assert(s.succeeds("schemaKHopPath('Job', 'File', 1)"))
    assert(s.succeeds("schemaKHopPath('File', 'Job', 1)"))
    assert(!s.succeeds("schemaKHopPath('Job', 'Job', 1)"))
  }

  test("schemaKHopPath: job-to-job 2-hop is feasible (Fig. 3)") {
    assert(solver().succeeds("schemaKHopPath('Job', 'Job', 2)"))
    assert(solver().succeeds("schemaKHopPath('File', 'File', 2)"))
  }

  test("schemaKHopPath (acyclic trails) caps at the schema's trail length") {
    // The paper's Lst. 2 rule forbids schema-vertex revisits, so k=4 is NOT
    // derivable from it on the 2-type schema — the documented discrepancy
    // that schemaKHopWalk resolves.
    assert(!solver().succeeds("schemaKHopPath('Job', 'Job', 4)"))
  }

  test("schemaKHopWalk: even k job-to-job walks only") {
    val s = solver()
    for (k <- Seq(2, 4, 6, 8, 10))
      assert(s.succeeds(s"schemaKHopWalk('Job', 'Job', $k)"), s"expected even k=$k feasible")
    for (k <- Seq(1, 3, 5, 7, 9))
      assert(!s.succeeds(s"schemaKHopWalk('Job', 'Job', $k)"), s"odd k=$k must be infeasible")
  }

  test("schemaKHopWalk: odd k only between Job and File") {
    val s = solver()
    assert(s.succeeds("schemaKHopWalk('Job', 'File', 3)"))
    assert(!s.succeeds("schemaKHopWalk('Job', 'File', 2)"))
  }

  test("schemaKHopWalk on raw prov schema: Job can reach Machine in 2..3 hops") {
    val s = solver(GraphSchema.provRaw)
    assert(s.succeeds("schemaKHopWalk('Job', 'Machine', 2)")) // Job→Task→Machine
    assert(s.succeeds("schemaKHopWalk('Job', 'Machine', 3)")) // Job→Task→Task→Machine
    assert(!s.succeeds("schemaKHopWalk('Job', 'Machine', 1)"))
    assert(!s.succeeds("schemaKHopWalk('Machine', 'Job', 1)")) // Machine is a sink
  }

  test("schemaPath: reachability over the schema") {
    val s = solver(GraphSchema.provRaw)
    assert(s.succeeds("schemaPath('Job', 'Machine')"))
    assert(s.succeeds("schemaPath('File', 'File')"))
    assert(!s.succeeds("schemaPath('Machine', 'Job')"))
  }

  test("schemaPathVia: single-edge-type schema paths") {
    val s = solver(GraphSchema.provRaw)
    assert(s.succeeds("schemaPathVia('Task', 'Task', 'TRANSFERS_TO')"))
    assert(!s.succeeds("schemaPathVia('Job', 'Job', 'WRITES_TO')"))
  }

  test("schemaEdgeType enumerates the schema's edge vocabulary") {
    val s = solver(GraphSchema.provRaw)
    val types = s.query("schemaEdgeType(E)", "E").map(_("E").show).toSet
    assert(types == Set("'WRITES_TO'", "'IS_READ_BY'", "'SPAWNS'", "'TRANSFERS_TO'", "'RUNS_ON'"))
  }

  // ---- query rules ---------------------------------------------------------

  test("queryKHopVariableLengthPath expands bounds via between/3") {
    val ks = solver().query("queryKHopVariableLengthPath(q_f1, q_f2, K)", "K")
      .map(_("K")).collect { case Num(v) => v }.toList
    assert(ks == (0L to 8L).toList)
  }

  test("queryKHopPath: single fixed edges are 1-hop paths") {
    val s = solver()
    assert(s.succeeds("queryKHopPath(q_j1, q_f1, 1)"))
    assert(s.succeeds("queryKHopPath(q_f2, q_j2, 1)"))
  }

  test("queryKHopPath: end-to-end lengths are exactly 2..10 (§ IV-B)") {
    val ks = solver().query("queryKHopPath(q_j1, q_j2, K)", "K")
      .map(_("K")).collect { case Num(v) => v }.toSet
    assert(ks == (2L to 10L).toSet)
  }

  test("queryPath holds along the pattern") {
    val s = solver()
    assert(s.succeeds("queryPath(q_j1, q_j2)"))
    assert(s.succeeds("queryPath(q_f1, q_j2)"))
    assert(!s.succeeds("queryPath(q_j2, q_j1)"))
  }

  test("query source and sink detection (var-length paths count)") {
    val s = solver()
    val sources = s.query("queryVertexSource(X)", "X").map(_("X").show).toSet
    val sinks = s.query("queryVertexSink(X)", "X").map(_("X").show).toSet
    assert(sources == Set("q_j1"))
    assert(sinks == Set("q_j2"))
  }

  test("query vertex degrees") {
    val s = solver()
    assert(s.succeeds("queryVertexInDegree(q_j1, 0)"))
    assert(s.succeeds("queryVertexOutDegree(q_j1, 1)"))
    assert(s.succeeds("queryVertexInDegree(q_f1, 1)"))
    assert(s.succeeds("queryVertexOutDegree(q_f1, 1)")) // the var-length path
  }

  test("queryVertexKHopNbors collects sorted unique neighbours") {
    val s = solver()
    // In: q_j1 (fixed edge); out: q_f2 (the 0..8 var-length path admits k=1)
    // and q_j2 (0-hop var-length prefix + the IS_READ_BY edge).
    val r = s.query("queryVertexKHopNbors(1, q_f1, L)", "L").head
    assert(r("L").show == "[q_f2,q_j1,q_j2]")
  }

  test("kHopNborsAggregator folds a property over the neighbourhood") {
    val q = CypherParser.parse("MATCH (a:Job)-[:WRITES_TO]->(f:File)-[:IS_READ_BY]->(b:Job) RETURN a, b")
    val extra =
      """property(bytes, a, 10).
        |property(bytes, f, 5).
        |property(bytes, b, 7).
        |""".stripMargin
    val s = new Solver(ViewEnumerator.buildDatabase(q, GraphSchema.provSummarized, extra))
    // 1-hop neighbourhood of f is {a, b}: sum of bytes = 17.
    val r = s.query("kHopNborsAggregator(1, f, bytes, sum, R)", "R").head
    assert(r("R") == Num(17))
  }
}
