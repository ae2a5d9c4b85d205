package repro.graph

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._

/** Distributed r-hop aggregation via iterative message passing — the
  * dataflow form of the paper's offline aggregates (Alg. 2, lines 6–9):
  *
  *  - `bv_r(v)`   = bit-OR of keyword bit vectors over the r-hop ball of v
  *                  (`v.BV_r` in the paper);
  *  - `ubsup_r(v)` = max over vertices u in the r-hop ball of v of the
  *                  maximum whole-graph support of edges incident to u
  *                  (`v.ub_sup_r`; see DESIGN.md — marginally looser than
  *                  the paper's per-ball edge max, but still a safe upper
  *                  bound, and identical to what [[repro.index.Precompute]]
  *                  computes locally, so the two paths cross-validate).
  *
  * Both are (⊕, max) semiring propagations: r rounds of "join neighbours'
  * state, aggregate per destination, merge with own state".
  */
object HopAgg {

  /** Run `rMax` rounds of message passing.
    *
    * @param vertexState (id: Long, bv: Long, inc: Long) — per-vertex
    *                    keyword bit vector and max incident edge support
    * @param edges       directed edge list (src, dst); must be symmetric
    * @return (id, r, bv_r, ubsup_r) for every vertex and r ∈ [1, rMax]
    */
  def aggregate(
      spark: SparkSession,
      vertexState: DataFrame,
      edges: DataFrame,
      rMax: Int): DataFrame = {
    require(rMax >= 1)
    val adj = edges.select(col("src"), col("dst")).cache()
    var state = vertexState.select(col("id"), col("bv"), col("inc")).cache()
    var out: DataFrame = null
    for (r <- 1 to rMax) {
      val msgs = adj
        .join(state.withColumnRenamed("id", "src"), "src")
        .groupBy(col("dst").as("id"))
        .agg(expr("bit_or(bv)").as("mBv"), max(col("inc")).as("mInc"))
      val next = state
        .join(msgs, Seq("id"), "left")
        .select(
          col("id"),
          (col("bv").bitwiseOR(coalesce(col("mBv"), lit(0L)))).as("bv"),
          greatest(col("inc"), coalesce(col("mInc"), lit(Long.MinValue))).as("inc"))
        .cache()
      next.count() // materialize before unpersisting the previous round
      state.unpersist()
      state = next
      val snapshot = state.select(
        col("id"), lit(r).as("r"), col("bv").as("bv_r"), col("inc").as("ubsup_r"))
      out = if (out == null) snapshot else out.union(snapshot)
    }
    out
  }
}
