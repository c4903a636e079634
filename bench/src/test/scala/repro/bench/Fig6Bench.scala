package repro.bench

import repro.SparkSpec
import repro.experiments.Fig6

/** Reproduces Fig. 6 as a table: effective graph size after the schema-level
  * summarizer and the 2-hop connector, for prov and dblp.
  */
class Fig6Bench extends SparkSpec {

  private lazy val rows = Fig6.run(spark)

  private def size(ds: String, stage: String): Double =
    rows.find(r => r.dataset == ds && r.stage == stage).get.effectiveSize.toDouble

  test("Fig. 6 — print effective size reduction") {
    println("\n== Fig. 6: effective graph size reduction (summarizer, connector) ==")
    println(Fig6.format(rows))
    assert(rows.size == 6)
  }

  test("Fig. 6 shape: prov summarizer reduces by well over an order of magnitude") {
    val reduction = size("prov", "raw") / size("prov", "summarizer")
    assert(reduction > 20.0, s"prov summarizer reduction only ${reduction}x")
  }

  test("Fig. 6 shape: prov connector reduces the summarized graph further") {
    val reduction = size("prov", "summarizer") / size("prov", "2-hop connector")
    assert(reduction > 3.0, s"prov connector reduction only ${reduction}x")
  }

  test("Fig. 6 shape: dblp summarizer trims venues modestly") {
    val reduction = size("dblp", "raw") / size("dblp", "summarizer")
    assert(reduction > 1.05 && reduction < 10.0, s"dblp summarizer reduction ${reduction}x")
  }

  test("Fig. 6 shape: dblp connector reduces the summarized graph") {
    val reduction = size("dblp", "summarizer") / size("dblp", "2-hop connector")
    assert(reduction > 1.5, s"dblp connector reduction only ${reduction}x")
  }

  test("Fig. 6 shape: combined prov reduction spans orders of magnitude") {
    val total = size("prov", "raw") / size("prov", "2-hop connector")
    assert(total > 100.0, s"prov total reduction only ${total}x")
  }
}
