package repro.core

import repro.cypher.QueryGraph
import repro.graph.{GraphSchema, GraphStats}

/** The chosen rewriting of a query over a materialized connector view
  * (paper § V-C, Lst. 4): traverse `view.label` edges with a hop budget of
  * `[hopsLo, hopsHi]` instead of the original edge-level pattern.
  */
final case class Rewriting(
    view: KHopConnectorView,
    hopsLo: Int,
    hopsHi: Int,
    costOriginal: Double,
    costRewritten: Double,
) {
  def estimatedSpeedup: Double = costOriginal / math.max(costRewritten, 1e-9)

  /** The rewritten query in Cypher, shaped like the paper's Lst. 4. */
  def toCypher(srcVar: String = "x", dstVar: String = "y"): String =
    s"MATCH ($srcVar:${view.srcType}) -[:${view.label}*$hopsLo..$hopsHi]-> ($dstVar:${view.dstType}) " +
      s"RETURN $srcVar, $dstVar"
}

/** View-based query rewriting (paper § V-C): given a query and the set of
  * materialized views, pick the single view whose rewriting has the lowest
  * estimated evaluation cost (Kaskade rewrites over one view at a time).
  */
object QueryRewriter {

  /** All valid rewritings of `q` over the materialized views. A k-hop
    * connector (srcType → dstType) applies when the enumerator derives that
    * same instantiation for `q`; the original k-hop range [kMin, kMax]
    * contracts to [max(1, ⌈kMin/k⌉), ⌊kMax/k⌋] view hops.
    */
  def rewritings(
      q: QueryGraph,
      schema: GraphSchema,
      stats: GraphStats,
      materialized: Seq[CandidateView],
      materializedSizes: Map[String, Long] = Map.empty,
  ): Seq[Rewriting] = {
    val insts = ViewEnumerator.kHopInstantiations(q, schema)
    if (insts.isEmpty) return Nil
    val costRaw = CostModel.queryCostOnRaw(q, stats)

    materialized.collect { case v: KHopConnectorView =>
      val ks = insts.collect {
        case (_, _, st, dt, k) if st == v.srcType && dt == v.dstType => k
      }
      // The view applies if the query needs a path of exactly v.k hops (the
      // base segment the connector contracts) among its derivable lengths.
      if (ks.contains(v.k)) {
        val kMin = ks.min
        val kMax = ks.max
        val hopsLo = math.max(1, math.ceil(kMin.toDouble / v.k).toInt)
        val hopsHi = math.max(hopsLo, kMax / v.k)
        val costView =
          CostModel.queryCostOnView(q, v, stats, schema, materializedSizes.get(v.key))
        Some(Rewriting(v, hopsLo, hopsHi, costRaw, costView))
      } else None
    }.flatten
  }

  /** The best rewriting (lowest estimated cost), if any view applies and
    * actually improves on the raw plan.
    */
  def rewrite(
      q: QueryGraph,
      schema: GraphSchema,
      stats: GraphStats,
      materialized: Seq[CandidateView],
      materializedSizes: Map[String, Long] = Map.empty,
  ): Option[Rewriting] =
    rewritings(q, schema, stats, materialized, materializedSizes)
      .filter(r => r.costRewritten <= r.costOriginal)
      .minByOption(_.costRewritten)
}
