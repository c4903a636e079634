package repro

/** Self-tests for the DuckDB oracle harness itself. */
class OracleSpec extends SparkSpec {
  import spark.implicits._

  test("accepts an equivalent aggregate") {
    val df = Seq((1L, 2.0), (1L, 4.0), (2L, 6.0)).toDF("k", "v")
    Oracle.assertEquivalent(
      df.groupBy("k").avg("v").withColumnRenamed("avg(v)", "a"),
      "SELECT k AS k, AVG(CAST(v AS DOUBLE)) AS a FROM t GROUP BY k",
      "t" -> df)
  }

  test("rejects a wrong result") {
    val df = Seq((1L, 2.0)).toDF("k", "v")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(
        df.select($"k", ($"v" + 1).as("v2")),
        "SELECT k AS k, CAST(v AS DOUBLE) AS v2 FROM t", // off by one
        "t" -> df)
    }
  }

  test("rejects mismatched column sets") {
    val df = Seq((1L, 2.0)).toDF("k", "v")
    assertThrows[IllegalArgumentException] {
      Oracle.assertEquivalent(df, "SELECT k AS wrong FROM t", "t" -> df)
    }
  }

  test("null handling is symmetric") {
    val df = Seq((Some(1L), Option.empty[String]), (Some(2L), Some("x")))
      .toDF("k", "s")
    Oracle.assertEquivalent(df, "SELECT k AS k, s AS s FROM t", "t" -> df)
  }

  test("recursive CTEs work in the in-process DuckDB") {
    val edges = Seq((1L, 2L), (2L, 3L), (3L, 4L)).toDF("src", "dst")
    val reach = Seq((2L), (3L), (4L)).toDF("v")
    Oracle.assertEquivalent(
      reach,
      """WITH RECURSIVE r(v) AS (
        |  SELECT dst FROM e WHERE src = '1'
        |  UNION
        |  SELECT e.dst FROM r JOIN e ON r.v = e.src
        |) SELECT v AS v FROM r""".stripMargin,
      "e" -> edges)
  }
}
