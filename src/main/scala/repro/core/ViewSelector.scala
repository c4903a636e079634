package repro.core

import repro.cypher.QueryGraph
import repro.graph.{GraphSchema, GraphStats}

/** View selection (paper § V-B): given a query workload, pick the views to
  * materialize under a space budget, as a 0-1 knapsack — weight = estimated
  * view size, value = Σ_q (performance improvement of the view for q)
  * divided by the view's creation cost.
  */
object ViewSelector {

  /** A candidate scored against the whole workload. */
  final case class ScoredView(
      view: CandidateView,
      size: Double,
      creationCost: Double,
      improvement: Double,
  ) {
    /** Knapsack value: improvement penalized by creation cost (§ V-B). */
    def value: Double = improvement / math.max(creationCost, 1.0)
  }

  /** Performance improvement of `view` for query `q`: cost(q) / cost(q over
    * view), or 0 when the view does not apply (§ V-B).
    */
  def improvementFor(
      q: QueryGraph,
      view: CandidateView,
      schema: GraphSchema,
      stats: GraphStats,
  ): Double = view match {
    case v: KHopConnectorView =>
      QueryRewriter.rewritings(q, schema, stats, Seq(v))
        .headOption
        .map(r => r.costOriginal / math.max(r.costRewritten, 1e-9))
        .getOrElse(0.0)
    case _ =>
      // Summarizer/other views: improvement modeled as the size reduction
      // factor they give this query's traversal (raw edges / view edges).
      val vs = CostModel.viewSize(view, stats, schema)
      val applies = ViewEnumerator.enumerate(q, schema).exists(_.key == view.key)
      if (!applies || vs <= 0) 0.0 else stats.edgeCount.toDouble / math.max(vs, 1.0)
  }

  /** Enumerate, score, and select views for a workload within the budget
    * (budget in estimated edges — the paper's budget is a share of memory,
    * which is proportional).
    *
    * Optional `queryWeights` mirror the paper's extension for weighting
    * queries by frequency/expense.
    */
  def select(
      workload: Seq[QueryGraph],
      schema: GraphSchema,
      stats: GraphStats,
      budgetEdges: Long,
      queryWeights: Option[Seq[Double]] = None,
  ): Seq[ScoredView] = {
    val weights = queryWeights.getOrElse(Seq.fill(workload.size)(1.0))
    require(weights.size == workload.size, "one weight per query required")

    val candidates: Seq[CandidateView] =
      workload.flatMap(q => ViewEnumerator.enumerate(q, schema))
        .groupBy(_.key).map(_._2.head).toSeq.sortBy(_.key)

    val scored = candidates.map { v =>
      val size = CostModel.viewSize(v, stats, schema)
      val creation = CostModel.creationCost(v, stats, schema)
      val improvement = workload.zip(weights)
        .map { case (q, w) => w * improvementFor(q, v, schema, stats) }
        .sum
      ScoredView(v, size, creation, improvement)
    }.filter(_.improvement > 0)

    val items = scored.map(s => Knapsack.Item(math.max(0L, math.round(s.size)), s.value)).toIndexedSeq
    val (_, chosen) = Knapsack.solve(items, budgetEdges)
    chosen.map(scored).sortBy(-_.value)
  }
}
