package repro.bench

import repro.SparkSpec
import repro.experiments.Table3

/** Reproduces Table III at bench scale and checks the scale-invariant shape:
  * E/V ratios close to the paper's and a raw→summarized reduction of the
  * same character (tasks dominate the raw provenance graph).
  */
class Table3Bench extends SparkSpec {

  private lazy val rows = Table3.run(spark)

  test("Table III — print dataset sizes (paper vs ours)") {
    println("\n== Table III: networks used for evaluation (scaled reproduction) ==")
    println(Table3.format(rows))
    assert(rows.size == 5)
  }

  test("Table III shape: raw prov is orders of magnitude larger than summarized") {
    val raw = rows.find(_.name == "prov (raw)").get
    val summ = rows.find(_.name == "prov (summarized)").get
    assert(raw.edges.toDouble / summ.edges > 30.0,
      s"raw/summarized edge ratio too small: ${raw.edges}/${summ.edges}")
    assert(raw.vertices.toDouble / summ.vertices > 30.0)
  }

  test("Table III shape: E/V ratios track the paper's") {
    def check(name: String, tolFactor: Double): Unit = {
      val r = rows.find(_.name == name).get
      assert(r.evRatio > r.paperEvRatio / tolFactor && r.evRatio < r.paperEvRatio * tolFactor,
        s"$name E/V=${r.evRatio} vs paper ${r.paperEvRatio}")
    }
    check("prov (summarized)", 2.0)
    check("dblp-net", 2.0)
    check("soc-livejournal", 2.0)
    check("roadnet-usa", 1.5)
  }

  test("Table III shape: heterogeneous graphs have multiple vertex types") {
    // prov raw spans Job/File/Task/Machine; homogeneous sets are single-type.
    import repro.graph.GraphGen
    val raw = GraphGen.provRaw(spark, 64, tasksPerJob = 10)
    val types = raw.vertices.select("vtype").distinct().count()
    assert(types == 4)
    val soc = GraphGen.socLivejournal(spark, 500)
    assert(soc.vertices.select("vtype").distinct().count() == 1)
  }
}
