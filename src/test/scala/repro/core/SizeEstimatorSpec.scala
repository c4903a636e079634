package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{GraphSchema, GraphStats, TypeStats}

class SizeEstimatorSpec extends AnyFunSuite {

  test("logChoose matches small exact binomials") {
    assert(math.abs(math.exp(SizeEstimator.logChoose(5, 2)) - 10.0) < 1e-9)
    assert(math.abs(math.exp(SizeEstimator.logChoose(10, 3)) - 120.0) < 1e-6)
    assert(math.abs(math.exp(SizeEstimator.logChoose(4, 0)) - 1.0) < 1e-12)
  }

  test("logChoose of infeasible selection is -inf") {
    assert(SizeEstimator.logChoose(3, 5).isNegInfinity)
  }

  test("Erdős–Rényi estimator Eq. 1 closed form, k=1") {
    // k=1: C(n,2) * m/C(n,2) = m.
    assert(math.abs(SizeEstimator.erdosRenyi(100, 500, 1) - 500.0) < 1e-6)
  }

  test("Erdős–Rényi estimator Eq. 1 closed form, k=2") {
    // C(n,3) * (m/C(n,2))^2 for n=10, m=20: 120 * (20/45)^2 = 23.7037...
    val expected = 120.0 * math.pow(20.0 / 45.0, 2)
    assert(math.abs(SizeEstimator.erdosRenyi(10, 20, 2) - expected) < 1e-9)
  }

  test("Erdős–Rényi estimator degenerate cases") {
    assert(SizeEstimator.erdosRenyi(1, 0, 2) == 0.0)
    assert(SizeEstimator.erdosRenyi(10, 0, 2) == 0.0)
  }

  test("homogeneous estimator Eq. 2: n · deg^k") {
    assert(SizeEstimator.homogeneous(1000, 3.0, 2) == 9000.0)
    assert(SizeEstimator.homogeneous(1000, 3.0, 1) == 3000.0)
    assert(SizeEstimator.homogeneous(10, 0.0, 2) == 0.0)
  }

  private val hetero = GraphStats(
    vertexCount = 300,
    edgeCount = 900,
    perType = Seq(
      TypeStats("Job", 100, 2.0, 4.0, 5.0, 10.0),
      TypeStats("File", 200, 1.0, 2.0, 3.0, 8.0)))

  test("heterogeneous estimator Eq. 3 sums over source types") {
    // Both Job and File are edge sources in the prov schema.
    val e = SizeEstimator.heterogeneous(hetero, GraphSchema.provSummarized, 2, 95)
    assert(e == 100 * 5.0 * 5.0 + 200 * 3.0 * 3.0)
  }

  test("heterogeneous estimator skips non-source types") {
    // Machine-only sink type contributes nothing.
    val stats = GraphStats(400, 900,
      hetero.perType :+ TypeStats("Machine", 100, 9.0, 9.0, 9.0, 9.0))
    val schema = GraphSchema(
      Seq("Job", "File", "Machine"),
      GraphSchema.provSummarized.edges) // Machine never a source
    val e = SizeEstimator.estimate(stats, schema, 2, 95)
    assert(e == SizeEstimator.heterogeneous(hetero, GraphSchema.provSummarized, 2, 95))
  }

  test("estimate() dispatches to Eq. 2 on homogeneous schemas") {
    val stats = GraphStats(1000, 14000, Seq(TypeStats("Node", 1000, 5.0, 20.0, 30.0, 100.0)))
    assert(SizeEstimator.estimate(stats, GraphSchema.homogeneous(), 2, 95) == 1000 * 30.0 * 30.0)
    assert(SizeEstimator.estimate(stats, GraphSchema.homogeneous(), 2, 50) == 1000 * 5.0 * 5.0)
  }

  test("α=100 dominates lower percentiles (upper-bound property)") {
    val stats = GraphStats(1000, 14000, Seq(TypeStats("Node", 1000, 5.0, 20.0, 30.0, 100.0)))
    val s = GraphSchema.homogeneous()
    val e50 = SizeEstimator.estimate(stats, s, 3, 50)
    val e95 = SizeEstimator.estimate(stats, s, 3, 95)
    val e100 = SizeEstimator.estimate(stats, s, 3, 100)
    assert(e50 <= e95 && e95 <= e100)
  }

  test("estimates grow with k when deg > 1") {
    val stats = GraphStats(1000, 14000, Seq(TypeStats("Node", 1000, 5.0, 20.0, 30.0, 100.0)))
    val s = GraphSchema.homogeneous()
    val es = (1 to 5).map(k => SizeEstimator.estimate(stats, s, k, 95))
    assert(es == es.sorted)
  }
}
