package repro.core

import repro.graph.{GraphSchema, GraphStats}

/** Graph-view size estimators (paper § V-A): the number of k-length paths in
  * the graph, which equals the edge count of a (non-deduplicated) k-hop
  * connector.
  */
object SizeEstimator {

  /** log of the binomial coefficient C(n, k), exact summation (k is small). */
  def logChoose(n: Double, k: Int): Double = {
    require(k >= 0, "k must be non-negative")
    if (k == 0 || n <= 0) 0.0
    else if (n < k) Double.NegativeInfinity
    else (0 until k).map(i => math.log(n - i)).sum - (1 to k).map(i => math.log(i.toDouble)).sum
  }

  /** Eq. 1 — Erdős–Rényi estimator: `C(n, k+1) · [m / C(n,2)]^k`. The paper
    * shows it underestimates real graphs by orders of magnitude; it is the
    * baseline of the Fig. 5 experiment.
    */
  def erdosRenyi(n: Long, m: Long, k: Int): Double = {
    if (n < 2 || m == 0) return 0.0
    val logP = math.log(m.toDouble) - logChoose(n.toDouble, 2)
    math.exp(logChoose(n.toDouble, k + 1) + k * logP)
  }

  /** Eq. 2 — homogeneous estimator: `n · deg_α^k`. */
  def homogeneous(n: Long, degAlpha: Double, k: Int): Double =
    n * math.pow(degAlpha, k)

  /** Eq. 3 — heterogeneous estimator: `Σ_t n_t · deg_α(t)^k` over vertex
    * types `t` that are the source of at least one schema edge type.
    */
  def heterogeneous(stats: GraphStats, schema: GraphSchema, k: Int, alpha: Int): Double =
    schema.sourceTypes.map { t =>
      val ts = stats.typeStats(t)
      ts.n * math.pow(ts.degAt(alpha), k)
    }.sum

  /** Dispatch on graph schema: Eq. 2 for homogeneous, Eq. 3 otherwise. */
  def estimate(stats: GraphStats, schema: GraphSchema, k: Int, alpha: Int): Double =
    if (schema.isHomogeneous) homogeneous(stats.vertexCount, stats.pooled.degAt(alpha), k)
    else heterogeneous(stats, schema, k, alpha)
}
