package repro.experiments

import repro.SparkSpec
import repro.graph.GraphGen

class Fig5PrefixSpec extends SparkSpec {

  private lazy val g = GraphGen.provSummarized(spark, nJobs = 64).cache()

  test("prefix keeps exactly n edges") {
    assert(Fig5.prefix(g, 100).edgeCount == 100)
  }

  test("prefix larger than the graph keeps everything") {
    val total = g.edgeCount
    assert(Fig5.prefix(g, total + 1000).edgeCount == total)
  }

  test("prefix vertices are exactly the incident ones") {
    import org.apache.spark.sql.functions._
    val p = Fig5.prefix(g, 200)
    val incident = p.edges.select(col("src").as("id"))
      .union(p.edges.select(col("dst").as("id"))).distinct().count()
    assert(p.vertexCount == incident)
  }

  test("prefix is deterministic") {
    val a = Fig5.prefix(g, 150).edges
    val b = Fig5.prefix(g, 150).edges
    assert(a.exceptAll(b).count() == 0)
    assert(b.exceptAll(a).count() == 0)
  }

  test("hash ordering interleaves both edge types early") {
    import org.apache.spark.sql.functions._
    val p = Fig5.prefix(g, 200)
    val types = p.edges.select("etype").distinct().collect().map(_.getString(0)).toSet
    assert(types == Set("WRITES_TO", "IS_READ_BY"))
  }

  test("prefixes are nested: smaller is a subset of larger") {
    val small = Fig5.prefix(g, 100).edges
    val large = Fig5.prefix(g, 300).edges
    assert(small.exceptAll(large).count() == 0)
  }
}
