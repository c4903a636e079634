package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.cypher.CypherParser
import repro.graph.GraphSchema

class ConstraintMinerSpec extends AnyFunSuite {

  private val blastRadius = CypherParser.parse(
    """MATCH (q_j1:Job) -[:WRITES_TO]-> (q_f1:File),
      |      (q_f1:File) -[r*0..8]-> (q_f2:File),
      |      (q_f2:File) -[:IS_READ_BY]-> (q_j2:Job)
      |RETURN q_j1 as A, q_j2 as B""".stripMargin)

  test("emits all query vertex facts of the § IV-A1 listing") {
    val facts = ConstraintMiner.queryFacts(blastRadius)
    for (v <- Seq("q_f1", "q_f2", "q_j1", "q_j2"))
      assert(facts.contains(s"queryVertex($v)."), s"missing queryVertex($v)")
  }

  test("emits vertex type facts") {
    val facts = ConstraintMiner.queryFacts(blastRadius)
    assert(facts.contains("queryVertexType(q_f1, 'File')."))
    assert(facts.contains("queryVertexType(q_f2, 'File')."))
    assert(facts.contains("queryVertexType(q_j1, 'Job')."))
    assert(facts.contains("queryVertexType(q_j2, 'Job')."))
  }

  test("emits edge and edge type facts") {
    val facts = ConstraintMiner.queryFacts(blastRadius)
    assert(facts.contains("queryEdge(q_j1, q_f1)."))
    assert(facts.contains("queryEdge(q_f2, q_j2)."))
    assert(facts.contains("queryEdgeType(q_j1, q_f1, 'WRITES_TO')."))
    assert(facts.contains("queryEdgeType(q_f2, q_j2, 'IS_READ_BY')."))
  }

  test("emits the variable-length path fact") {
    val facts = ConstraintMiner.queryFacts(blastRadius)
    assert(facts.contains("queryVariableLengthPath(q_f1, q_f2, 0, 8)."))
  }

  test("emits projected-vertex facts for the RETURN clause") {
    val facts = ConstraintMiner.queryFacts(blastRadius)
    assert(facts.contains("queryVertexProjected(q_j1)."))
    assert(facts.contains("queryVertexProjected(q_j2)."))
    assert(!facts.contains("queryVertexProjected(q_f1)."))
  }

  test("emits the schema facts of the § IV-A1 listing") {
    val facts = ConstraintMiner.schemaFacts(GraphSchema.provSummarized)
    assert(facts.contains("schemaVertex('Job')."))
    assert(facts.contains("schemaVertex('File')."))
    assert(facts.contains("schemaEdge('Job', 'File', 'WRITES_TO')."))
    assert(facts.contains("schemaEdge('File', 'Job', 'IS_READ_BY')."))
  }

  test("the emitted program is parseable Prolog") {
    val db = repro.prolog.Database.withPrelude()
    db.consult(ConstraintMiner.facts(blastRadius, GraphSchema.provRaw))
    assert(db.clausesFor("queryVertex", 1).size == 4)
    assert(db.clausesFor("schemaEdge", 3).size == GraphSchema.provRaw.edges.size)
  }

  test("atom quoting: mixed case and specials are quoted, plain are not") {
    assert(ConstraintMiner.atom("q_j1") == "q_j1")
    assert(ConstraintMiner.atom("Job") == "'Job'")
    assert(ConstraintMiner.atom("WRITES_TO") == "'WRITES_TO'")
    assert(ConstraintMiner.atom("it's") == "'it\\'s'")
  }

  test("untyped vertices get no type fact") {
    val q = CypherParser.parse("MATCH (a)-[:R]->(b:Y) RETURN a")
    val facts = ConstraintMiner.queryFacts(q)
    assert(facts.contains("queryVertex(a)."))
    assert(!facts.contains("queryVertexType(a"))
    assert(facts.contains("queryVertexType(b, 'Y')."))
  }

  test("untyped edges get no edge-type fact") {
    val q = CypherParser.parse("MATCH (a:X)-[e]->(b:Y) RETURN a")
    val facts = ConstraintMiner.queryFacts(q)
    assert(facts.contains("queryEdge(a, b)."))
    assert(!facts.contains("queryEdgeType(a"))
  }
}
