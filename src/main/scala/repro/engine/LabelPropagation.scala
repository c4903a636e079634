package repro.engine

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Iterative label propagation for community detection (Q7) — the DataFrame
  * equivalent of the APOC procedure the paper runs on Neo4j.
  *
  * Deterministic synchronous variant: every vertex adopts the most frequent
  * label in its closed neighbourhood (neighbours plus its own current label —
  * the self-vote prevents the two-cycle oscillation synchronous LPA is prone
  * to); ties break toward the smallest label, isolated vertices keep their
  * own label. Determinism makes the raw-vs-view community comparison in
  * tests reproducible.
  */
object LabelPropagation {

  /** Run `iters` passes; returns `(id, label)`. */
  def run(vertices: DataFrame, edges: DataFrame, iters: Int): DataFrame = {
    val nbrs = edges.select(col("src").as("v"), col("dst").as("nbr"))
      .union(edges.select(col("dst").as("v"), col("src").as("nbr")))
      .distinct()
      .localCheckpoint()

    var labels = vertices.select(col("id"), col("id").as("label")).localCheckpoint()

    for (_ <- 1 to iters) {
      val votes = nbrs
        .join(labels.select(col("id").as("nbr"), col("label").as("nbrLabel")), Seq("nbr"))
        .select(col("v"), col("nbrLabel"))
        .union(labels.select(col("id").as("v"), col("label").as("nbrLabel"))) // self-vote
      val nbrLabels = votes
        .groupBy(col("v"), col("nbrLabel"))
        .agg(count(lit(1)).as("cnt"))
      val best = nbrLabels
        .groupBy(col("v"))
        // max over (count, -label): most frequent label, smallest label on ties
        .agg(max(struct(col("cnt"), (-col("nbrLabel")).as("negLabel"))).as("m"))
        .select(col("v").as("id"), (-col("m.negLabel")).as("newLabel"))
      labels = labels
        .join(best, Seq("id"), "left")
        .select(col("id"), coalesce(col("newLabel"), col("label")).as("label"))
        .localCheckpoint()
    }
    labels
  }
}
