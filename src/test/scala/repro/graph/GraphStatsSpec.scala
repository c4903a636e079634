package repro.graph

import repro.SparkSpec

class GraphStatsSpec extends SparkSpec {

  /** 3 jobs with out-degrees 3, 1, 0; 2 files with out-degrees 1, 0. */
  private lazy val g = PropertyGraph.of(
    spark,
    vertices = Seq(
      (0L, "Job", 1.0, "p0"), (1L, "Job", 2.0, "p0"), (2L, "Job", 3.0, "p1"),
      (10L, "File", 0.0, "s"), (11L, "File", 0.0, "s")),
    edges = Seq(
      (0L, 10L, "WRITES_TO", 1L), (0L, 11L, "WRITES_TO", 2L), (0L, 10L, "WRITES_TO", 3L),
      (1L, 11L, "WRITES_TO", 4L),
      (10L, 2L, "IS_READ_BY", 5L)))

  private lazy val stats = GraphStats.compute(g)

  test("vertex and edge totals") {
    assert(stats.vertexCount == 5)
    assert(stats.edgeCount == 5)
  }

  test("per-type cardinalities") {
    assert(stats.typeStats("Job").n == 3)
    assert(stats.typeStats("File").n == 2)
  }

  test("max out-degree per type") {
    assert(stats.typeStats("Job").degMax == 3.0)
    assert(stats.typeStats("File").degMax == 1.0)
  }

  test("median out-degree counts zero-degree vertices") {
    // Job out-degrees: 0, 1, 3 -> median 1; File: 0, 1 -> median 0.5.
    assert(stats.typeStats("Job").deg50 == 1.0)
    assert(stats.typeStats("File").deg50 == 0.5)
  }

  test("percentiles are monotone: p50 <= p90 <= p95 <= max") {
    for (t <- stats.perType) {
      assert(t.deg50 <= t.deg90)
      assert(t.deg90 <= t.deg95)
      assert(t.deg95 <= t.degMax)
    }
  }

  test("edge type counts") {
    assert(stats.edgeTypeCounts == Map("WRITES_TO" -> 4L, "IS_READ_BY" -> 1L))
  }

  test("unknown type yields zeroed stats") {
    val t = stats.typeStats("Nope")
    assert(t.n == 0 && t.degMax == 0.0)
  }

  test("degAt maps percentiles correctly and rejects others") {
    val t = stats.typeStats("Job")
    assert(t.degAt(50) == t.deg50)
    assert(t.degAt(95) == t.deg95)
    assert(t.degAt(100) == t.degMax)
    assertThrows[IllegalArgumentException](t.degAt(42))
  }

  test("pooled stats on a homogeneous graph equal the single type's") {
    val homo = PropertyGraph.of(
      spark,
      vertices = Seq((0L, "Node", 0.0, "g"), (1L, "Node", 0.0, "g")),
      edges = Seq((0L, 1L, "LINK", 1L)))
    val s = GraphStats.compute(homo)
    assert(s.pooled == s.typeStats("Node"))
  }
}
