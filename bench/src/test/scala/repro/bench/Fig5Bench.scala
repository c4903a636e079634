package repro.bench

import repro.SparkSpec
import repro.experiments.Fig5

/** Reproduces Fig. 5 as a table: estimated vs actual 2-hop connector sizes
  * over edge prefixes, and checks the estimator-quality claims of § VII-D.
  */
class Fig5Bench extends SparkSpec {

  private lazy val rows = Fig5.run(spark)

  private def rowsOf(ds: String) = rows.filter(_.dataset == ds)

  test("Fig. 5 — print estimated vs actual connector sizes") {
    println("\n== Fig. 5: 2-hop connector view sizes, estimated vs actual ==")
    println(Fig5.format(rows))
    assert(rows.nonEmpty)
    assert(rows.map(_.dataset).distinct.size == 4)
  }

  test("Fig. 5 shape: Erdős–Rényi underestimates, and increasingly so with size") {
    // Paper: Eq. 1 underestimates real graphs by orders of magnitude — the
    // gap widens with graph size. At bench scale we assert the direction at
    // the largest prefix and the widening trend.
    val soc = rowsOf("soc-livejournal").sortBy(_.prefixEdges)
    val last = soc.last
    assert(last.estErdosRenyi < last.actual2Hop,
      s"ER ${last.estErdosRenyi} should underestimate actual ${last.actual2Hop}")
    val firstRatio = soc.head.actual2Hop / math.max(1.0, soc.head.estErdosRenyi)
    val lastRatio = last.actual2Hop / math.max(1.0, last.estErdosRenyi)
    assert(lastRatio > firstRatio, s"underestimation should widen: $firstRatio -> $lastRatio")
  }

  test("Fig. 5 shape: α=95 upper-bounds and α=50 lower-bounds on power-law graphs") {
    // Smallest prefixes are near edge-disjoint; assert from 10k edges up.
    val soc = rowsOf("soc-livejournal").filter(_.prefixEdges >= 10000)
    assert(soc.nonEmpty)
    soc.foreach { r =>
      assert(r.estAlpha95 >= r.actual2Hop / 2.0,
        s"alpha=95 ${r.estAlpha95} should bound actual ${r.actual2Hop} at |E|=${r.prefixEdges}")
      assert(r.estAlpha50 <= r.actual2Hop * 2.0,
        s"alpha=50 ${r.estAlpha50} should stay below actual ${r.actual2Hop}")
    }
  }

  test("Fig. 5 shape: median estimator tracks the road network within an order") {
    val road = rowsOf("roadnet-usa").filter(_.prefixEdges >= 10000)
    assert(road.nonEmpty)
    road.foreach { r =>
      val ratio = r.estAlpha50 / math.max(1.0, r.actual2Hop.toDouble)
      assert(ratio > 0.1 && ratio < 15.0,
        s"alpha=50 ${r.estAlpha50} vs actual ${r.actual2Hop}: off by ${ratio}x")
    }
  }

  test("Fig. 5 shape: homogeneous 2-hop connectors exceed the original graph size") {
    // § VII-D: k-hop connectors of homogeneous networks are usually larger
    // than the original graph.
    val last = rowsOf("soc-livejournal").last
    assert(last.actual2Hop > last.prefixEdges,
      s"2-hop paths ${last.actual2Hop} vs |E| ${last.prefixEdges}")
  }

  test("Fig. 5 shape: heterogeneous prov connector stays comparatively small") {
    val prov = rowsOf("prov").last
    val soc = rowsOf("soc-livejournal").last
    assert(prov.actual2Hop.toDouble / prov.prefixEdges <
      soc.actual2Hop.toDouble / soc.prefixEdges)
  }

  test("Fig. 5 shape: actual connector size grows with the prefix") {
    for (ds <- rows.map(_.dataset).distinct) {
      val actuals = rowsOf(ds).sortBy(_.prefixEdges).map(_.actual2Hop)
      assert(actuals == actuals.sorted, s"$ds actuals not monotone: $actuals")
    }
  }
}
