package repro.core

import repro.{Oracle, SparkSpec}
import repro.engine.Queries
import repro.graph.{GraphGen, GraphSchema, GraphStats}

/** End-to-end pipeline over the provenance graph, mirroring Fig. 2:
  * profile → enumerate → select → materialize → rewrite → execute,
  * with result equivalence between the raw and rewritten plans.
  */
class KaskadeIntegrationSpec extends SparkSpec {

  private implicit lazy val s: org.apache.spark.sql.SparkSession = spark

  private lazy val raw = GraphGen.provRaw(spark, nJobs = 32, tasksPerJob = 8, nMachines = 4).cache()
  private lazy val summarized = GraphGen.provSummarized(spark, nJobs = 32).cache()

  private val blastRadiusCypher =
    """MATCH (q_j1:Job) -[:WRITES_TO]-> (q_f1:File),
      |      (q_f1:File) -[r*0..8]-> (q_f2:File),
      |      (q_f2:File) -[:IS_READ_BY]-> (q_j2:Job)
      |RETURN q_j1 as A, q_j2 as B""".stripMargin

  test("pipeline: summarizer chosen on the raw schema removes tasks+machines") {
    val kas = Kaskade.forGraph(raw, GraphSchema.provRaw)
    val q = kas.parse(blastRadiusCypher)
    val views = kas.enumerate(q)
    val incl = views.collectFirst { case v: VertexInclusionSummarizerView => v }
    assert(incl.isDefined)
    val filtered = kas.materialize(incl.get, raw)
    assert(filtered.vertexCount == summarized.vertexCount)
    assert(filtered.edgeCount == summarized.edgeCount)
  }

  test("pipeline: selection on the summarized graph materializes a connector that answers Q1") {
    val stats = GraphStats.compute(summarized)
    val kas = new Kaskade(GraphSchema.provSummarized, stats)
    val q = kas.parse(blastRadiusCypher)

    val selected = kas.selectViews(Seq(q), budgetEdges = 1_000_000L)
    assert(selected.nonEmpty, "no views selected under a generous budget")
    val connector = selected.collectFirst {
      case sv if sv.view.isInstanceOf[KHopConnectorView] => sv.view.asInstanceOf[KHopConnectorView]
    }
    assert(connector.isDefined, "expected a k-hop connector among selected views")

    val two = KHopConnectorView("Job", "Job", 2)
    val view = kas.materialize(two, summarized)
    assert(view.edgeCount > 0)

    val rw = kas.rewrite(q)
    assert(rw.isDefined)
    assert(rw.get.view.k == 2)
    assert(rw.get.hopsHi == 5)

    // Execute both plans; the rewriting is result-equivalent.
    val rawResult = Queries.q1BlastRadius(summarized, "Job", maxHops = CostModel.hopBudget(q))
    val viewResult = Queries.q1BlastRadius(view, "Job", maxHops = rw.get.hopsHi)
    assert(rawResult.exceptAll(viewResult).count() == 0)
    assert(viewResult.exceptAll(rawResult).count() == 0)
  }

  test("pipeline: rewritten Q1 result matches the DuckDB oracle end-to-end") {
    val stats = GraphStats.compute(summarized)
    val kas = new Kaskade(GraphSchema.provSummarized, stats)
    val q = kas.parse(blastRadiusCypher)
    val view = kas.materialize(KHopConnectorView("Job", "Job", 2), summarized)
    val rw = kas.rewrite(q).get
    val viewResult = Queries.q1BlastRadius(view, "Job", maxHops = rw.hopsHi)
    // Oracle computes Q1 on the ORIGINAL summarized graph with the full
    // 10-hop budget; equality shows the view plan answers the original query.
    Oracle.assertEquivalent(
      viewResult,
      """WITH RECURSIVE reach(root, v, d) AS (
        |  SELECT id, id, 0 FROM jobs
        |  UNION
        |  SELECT r.root, e.dst, r.d + 1 FROM reach r JOIN e ON r.v = e.src WHERE r.d < 10
        |),
        |pairs AS (SELECT DISTINCT root, v FROM reach WHERE root <> v),
        |jmeta AS (SELECT id, CAST(cpu AS DOUBLE) AS cpu, grp FROM vmeta WHERE vtype = 'Job'),
        |perroot AS (
        |  SELECT p.root, SUM(j.cpu) AS t_cpu FROM pairs p JOIN jmeta j ON p.v = j.id GROUP BY p.root
        |)
        |SELECT j.grp AS grp, AVG(pr.t_cpu) AS avg_cpu
        |FROM perroot pr JOIN jmeta j ON pr.root = j.id GROUP BY j.grp""".stripMargin,
      "e" -> summarized.edges.select("src", "dst"),
      "jobs" -> summarized.verticesOfType("Job").select("id"),
      "vmeta" -> summarized.vertices)
  }

  test("pipeline: estimator α=95 upper-bounds the materialized 2-hop path count") {
    val stats = GraphStats.compute(summarized)
    val est95 = SizeEstimator.estimate(stats, GraphSchema.provSummarized, 2, 95)
    val actual = repro.engine.GraphOps.countKHopPaths(summarized, 2)
    // α=95 is the paper's operational upper bound; allow slack for the
    // sub-percentile tail but require the right order of magnitude.
    assert(est95 >= actual * 0.5, s"est=$est95 actual=$actual")
  }

  test("pipeline: view-based rewriting is declined when no view matches") {
    val stats = GraphStats.compute(summarized)
    val kas = new Kaskade(GraphSchema.provSummarized, stats)
    val q = kas.parse(blastRadiusCypher)
    assert(kas.rewrite(q).isEmpty) // nothing materialized yet in this instance
  }

  test("dblp pipeline: author-to-author connector answers the co-authorship query") {
    val dblp = GraphGen.dblp(spark, nAuthors = 150, includeVenues = false).cache()
    val stats = GraphStats.compute(dblp)
    val kas = new Kaskade(GraphSchema.dblpSummarized, stats)
    val q = kas.parse(
      """MATCH (a1:Author)-[:WROTE]->(p:Publication),
        |      (p:Publication)-[:WRITTEN_BY]->(a2:Author)
        |RETURN a1, a2""".stripMargin)
    val views = kas.enumerate(q)
    assert(views.exists { case KHopConnectorView("Author", "Author", 2) => true; case _ => false })
    val view = kas.materialize(KHopConnectorView("Author", "Author", 2), dblp)
    val rw = kas.rewrite(q)
    assert(rw.isDefined && rw.get.hopsLo == 1 && rw.get.hopsHi == 1)
    // One hop on the connector = the original 2-hop co-authorship pairs.
    val direct = Queries.q3Descendants(dblp, "Author", maxHops = 2)
    val overView = Queries.q3Descendants(view, "Author", maxHops = 1)
    assert(direct.exceptAll(overView).count() == 0)
    assert(overView.exceptAll(direct).count() == 0)
  }
}
