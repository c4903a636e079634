package repro.engine

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.graph.{GraphGen, PropertyGraph}

class GraphOpsSpec extends SparkSpec {

  private lazy val prov = GraphGen.provSummarized(spark, nJobs = 48).cache()

  // ---- summarizers ---------------------------------------------------------

  test("vertex-inclusion summarizer keeps only requested types (oracle)") {
    val summ = GraphOps.vertexInclusionSummarizer(
      GraphGen.provRaw(spark, nJobs = 16, tasksPerJob = 5, nMachines = 3), Seq("Job", "File"))
    Oracle.assertEquivalent(
      summ.vertices.select("id", "vtype"),
      "SELECT id AS id, vtype AS vtype FROM v WHERE vtype IN ('Job','File')",
      "v" -> GraphGen.provRaw(spark, nJobs = 16, tasksPerJob = 5, nMachines = 3)
        .vertices.select("id", "vtype"))
  }

  test("vertex-inclusion summarizer keeps only induced edges (oracle)") {
    val raw = GraphGen.provRaw(spark, nJobs = 16, tasksPerJob = 5, nMachines = 3)
    val summ = GraphOps.vertexInclusionSummarizer(raw, Seq("Job", "File"))
    Oracle.assertEquivalent(
      summ.edges,
      """SELECT e.src AS src, e.dst AS dst, e.etype AS etype, e.ts AS ts
        |FROM e JOIN v a ON e.src = a.id JOIN v b ON e.dst = b.id
        |WHERE a.vtype IN ('Job','File') AND b.vtype IN ('Job','File')""".stripMargin,
      "e" -> raw.edges, "v" -> raw.vertices.select("id", "vtype"))
  }

  test("vertex-removal summarizer equals inclusion of the complement") {
    val raw = GraphGen.provRaw(spark, nJobs = 16, tasksPerJob = 5, nMachines = 3)
    val removed = GraphOps.vertexRemovalSummarizer(raw, Seq("Task", "Machine"))
    val included = GraphOps.vertexInclusionSummarizer(raw, Seq("Job", "File"))
    assert(removed.vertices.exceptAll(included.vertices).count() == 0)
    assert(included.vertices.exceptAll(removed.vertices).count() == 0)
    assert(removed.edges.exceptAll(included.edges).count() == 0)
  }

  test("edge-inclusion summarizer filters by edge type (oracle)") {
    val view = GraphOps.edgeInclusionSummarizer(prov, Seq("WRITES_TO"))
    Oracle.assertEquivalent(
      view.edges,
      "SELECT src AS src, dst AS dst, etype AS etype, ts AS ts FROM e WHERE etype = 'WRITES_TO'",
      "e" -> prov.edges)
  }

  test("edge-removal summarizer is the complement of inclusion") {
    val removed = GraphOps.edgeRemovalSummarizer(prov, Seq("WRITES_TO"))
    val included = GraphOps.edgeInclusionSummarizer(prov, Seq("IS_READ_BY"))
    assert(removed.edges.exceptAll(included.edges).count() == 0)
    assert(included.edges.exceptAll(removed.edges).count() == 0)
  }

  test("summarizing the raw prov graph yields the summarized generator output") {
    val raw = GraphGen.provRaw(spark, nJobs = 24, tasksPerJob = 6, nMachines = 3)
    val summ = GraphOps.vertexInclusionSummarizer(raw, Seq("Job", "File"))
    val direct = GraphGen.provSummarized(spark, nJobs = 24)
    assert(summ.edges.exceptAll(direct.edges).count() == 0)
    assert(direct.edges.exceptAll(summ.edges).count() == 0)
  }

  // ---- connectors ----------------------------------------------------------

  test("2-hop job-to-job connector equals the SQL self-join (oracle)") {
    val view = GraphOps.kHopConnector(prov, 2, "Job", "Job", "2_HOP_JOB_TO_JOB")
    Oracle.assertEquivalent(
      view.edges.select("src", "dst", "ts", "paths"),
      """SELECT a.src AS src, b.dst AS dst,
        |       MAX(GREATEST(CAST(a.ts AS BIGINT), CAST(b.ts AS BIGINT))) AS ts,
        |       COUNT(*) AS paths
        |FROM e a
        |JOIN e b ON a.dst = b.src
        |JOIN v vs ON vs.id = a.src AND vs.vtype = 'Job'
        |JOIN v vd ON vd.id = b.dst AND vd.vtype = 'Job'
        |WHERE a.src <> b.dst AND a.src <> a.dst AND b.src <> b.dst
        |GROUP BY a.src, b.dst""".stripMargin,
      "e" -> prov.edges, "v" -> prov.vertices.select("id", "vtype"))
  }

  test("connector view vertices are the endpoint-type vertices") {
    val view = GraphOps.kHopConnector(prov, 2, "Job", "Job", "J2J")
    val types = view.vertices.select("vtype").distinct().collect().map(_.getString(0)).toSet
    assert(types == Set("Job"))
    assert(view.vertices.count() == prov.verticesOfType("Job").count())
  }

  test("connector edges carry the requested label") {
    val view = GraphOps.kHopConnector(prov, 2, "Job", "Job", "2_HOP_JOB_TO_JOB")
    val labels = view.edges.select("etype").distinct().collect().map(_.getString(0)).toSet
    assert(labels == Set("2_HOP_JOB_TO_JOB"))
  }

  test("file-to-file 2-hop connector exists and differs from job-to-job (Fig. 3)") {
    val j2j = GraphOps.kHopConnector(prov, 2, "Job", "Job", "J2J")
    val f2f = GraphOps.kHopConnector(prov, 2, "File", "File", "F2F")
    assert(j2j.edges.count() > 0)
    assert(f2f.edges.count() > 0)
    // Disjoint endpoint id spaces.
    val jobIds = prov.verticesOfType("Job").select("id")
    assert(f2f.edges.join(jobIds.withColumnRenamed("id", "src"), Seq("src"), "left_semi").count() == 0)
  }

  test("4-hop job-to-job connector pairs equal two chained 2-hop connector hops") {
    val c2 = GraphOps.kHopConnector(prov, 2, "Job", "Job", "J2J").edges
      .select(col("src"), col("dst")).cache()
    val c4 = GraphOps.kHopConnector(prov, 4, "Job", "Job", "J4J").edges
      .select(col("src"), col("dst"))
    val chained = c2.join(c2.select(col("src").as("mid"), col("dst").as("d2")),
        col("dst") === col("mid"))
      .select(col("src"), col("d2").as("dst"))
      .filter(col("src") =!= col("dst"))
      .distinct()
    // Chained pairs go through an intermediate job; 4-hop paths with a
    // repeated endpoint-adjacent vertex are excluded in both. They agree.
    assert(c4.select("src", "dst").exceptAll(chained).count() == 0)
    assert(chained.exceptAll(c4.select("src", "dst")).count() == 0)
  }

  test("2-hop path count matches SQL (oracle, scalar)") {
    import spark.implicits._
    val n = GraphOps.countKHopPaths(prov, 2)
    Oracle.assertEquivalent(
      Seq(n).toDF("c"),
      """SELECT COUNT(*) AS c FROM e a JOIN e b ON a.dst = b.src
        |WHERE a.src <> b.dst AND a.src <> a.dst AND b.src <> b.dst""".stripMargin,
      "e" -> prov.edges)
  }

  test("connector on a hand-built path graph") {
    // a -> f -> b -> g -> c (jobs a,b,c; files f,g)
    val g = PropertyGraph.of(
      spark,
      vertices = Seq((1L, "Job", 1.0, "p"), (2L, "Job", 1.0, "p"), (3L, "Job", 1.0, "p"),
        (10L, "File", 0.0, "s"), (11L, "File", 0.0, "s")),
      edges = Seq((1L, 10L, "W", 5L), (10L, 2L, "R", 7L), (2L, 11L, "W", 9L), (11L, 3L, "R", 4L)))
    val view = GraphOps.kHopConnector(g, 2, "Job", "Job", "J2J")
    val rows = view.edges.select("src", "dst", "ts", "paths").collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2), r.getLong(3))).toSet
    assert(rows == Set((1L, 2L, 7L, 1L), (2L, 3L, 9L, 1L)))
  }

  test("connector multiplicity counts parallel contracted paths") {
    // Two distinct files both connect job 1 to job 2.
    val g = PropertyGraph.of(
      spark,
      vertices = Seq((1L, "Job", 1.0, "p"), (2L, "Job", 1.0, "p"),
        (10L, "File", 0.0, "s"), (11L, "File", 0.0, "s")),
      edges = Seq((1L, 10L, "W", 1L), (10L, 2L, "R", 2L),
        (1L, 11L, "W", 3L), (11L, 2L, "R", 8L)))
    val rows = GraphOps.kHopConnector(g, 2, "Job", "Job", "J2J")
      .edges.select("src", "dst", "ts", "paths").collect()
    assert(rows.length == 1)
    assert(rows(0).getLong(2) == 8L) // max ts across both paths
    assert(rows(0).getLong(3) == 2L) // two contracted paths
  }

  // ---- source-to-sink connector -------------------------------------------

  test("source-to-sink connector on a diamond DAG") {
    //  1 -> 2 -> 4 ; 1 -> 3 -> 4 ; source 1, sink 4
    val g = PropertyGraph.of(
      spark,
      vertices = (1L to 4L).map(i => (i, "Node", 0.0, "g")),
      edges = Seq((1L, 2L, "E", 1L), (2L, 4L, "E", 2L), (1L, 3L, "E", 3L), (3L, 4L, "E", 4L)))
    val view = GraphOps.sourceToSinkConnector(g, maxHops = 8, label = "S2S")
    val rows = view.edges.select("src", "dst", "paths").collect()
      .map(r => (r.getLong(0), r.getLong(1), r.getLong(2)))
    assert(rows.toSet == Set((1L, 4L, 2L))) // two contracted paths, one pair
    val vs = view.vertices.select("id").collect().map(_.getLong(0)).toSet
    assert(vs == Set(1L, 4L))
  }

  // ---- reachability --------------------------------------------------------

  test("reachablePairs matches a recursive CTE (oracle)") {
    val jobs = prov.verticesOfType("Job").select("id")
    val pairs = GraphOps.reachablePairs(prov.edges, jobs, maxHops = 4)
    Oracle.assertEquivalent(
      pairs,
      """WITH RECURSIVE reach(root, v, d) AS (
        |  SELECT id, id, 0 FROM roots
        |  UNION
        |  SELECT r.root, e.dst, r.d + 1 FROM reach r JOIN e ON r.v = e.src WHERE r.d < 4
        |)
        |SELECT DISTINCT root AS root, v AS v FROM reach WHERE root <> v""".stripMargin,
      "e" -> prov.edges.select("src", "dst"), "roots" -> jobs)
  }

  test("reachablePairs reversed matches the CTE on flipped edges (oracle)") {
    val jobs = prov.verticesOfType("Job").select("id").limit(8)
    val pairs = GraphOps.reachablePairs(prov.edges, jobs, maxHops = 3, reversed = true)
    Oracle.assertEquivalent(
      pairs,
      """WITH RECURSIVE reach(root, v, d) AS (
        |  SELECT id, id, 0 FROM roots
        |  UNION
        |  SELECT r.root, e.src, r.d + 1 FROM reach r JOIN e ON r.v = e.dst WHERE r.d < 3
        |)
        |SELECT DISTINCT root AS root, v AS v FROM reach WHERE root <> v""".stripMargin,
      "e" -> prov.edges.select("src", "dst"), "roots" -> jobs)
  }

  test("reachablePairs with zero hops is empty") {
    val jobs = prov.verticesOfType("Job").select("id")
    assert(GraphOps.reachablePairs(prov.edges, jobs, maxHops = 0).count() == 0)
  }

  test("reachablePairs grows monotonically with the hop budget") {
    val jobs = prov.verticesOfType("Job").select("id")
    val h2 = GraphOps.reachablePairs(prov.edges, jobs, 2).count()
    val h4 = GraphOps.reachablePairs(prov.edges, jobs, 4).count()
    assert(h2 <= h4)
    assert(h2 > 0)
  }
}
