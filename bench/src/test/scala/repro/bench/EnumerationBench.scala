package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.experiments.ViewCatalog

/** Reproduces Tables I and II (the view-type catalog, § VI) through the
  * enumerator, plus the § IV-B instantiation listing. Pure inference.
  */
class EnumerationBench extends AnyFunSuite {

  private lazy val catalog = ViewCatalog.run()

  test("Tables I & II — print the enumerated view catalog") {
    println("\n== Tables I & II: view types produced by the enumerator ==")
    println(ViewCatalog.format(catalog))
    assert(catalog.nonEmpty)
  }

  test("Table I: all four connector classes are represented") {
    val types = catalog.filter(_.table == "Table I").map(_.viewType).toSet
    assert(types.contains("k-hop same-vertex-type connector"))
    assert(types.contains("Same-vertex-type connector"))
    assert(types.contains("Source-to-sink connector"))
    // Same-edge-type connectors require a single-edge-type path in the
    // schema; the prov schemas alternate WRITES_TO/IS_READ_BY, so none is
    // expected here — the template itself is covered in ViewEnumeratorSpec.
  }

  test("Table II: summarizer classes are represented") {
    val types = catalog.filter(_.table == "Table II").map(_.viewType).toSet
    assert(types.contains("Vertex-inclusion summarizer"))
    assert(types.contains("Edge-inclusion summarizer"))
    assert(types.contains("Vertex-removal summarizer"))
    assert(types.contains("Edge-removal summarizer"))
  }

  test("§ IV-B listing — print and pin the kHopConnector instantiations") {
    val insts = ViewCatalog.instantiations()
    println("\n== § IV-B: kHopConnector instantiations for the blast-radius query ==")
    insts.foreach(println)
    assert(insts == Seq(2, 4, 6, 8, 10).map(k =>
      s"(X='q_j1', Y='q_j2', XTYPE='Job', YTYPE='Job', K=$k)"))
  }

  test("every enumerated view translates to Cypher") {
    catalog.foreach(r => assert(r.cypher.nonEmpty && r.cypher.contains("MATCH")))
  }
}
