package repro.index

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.graph.GraphData
import repro.influence.MIA
import repro.truss.Support

/** Offline pre-computation (paper Algorithm 2).
  *
  * For every vertex v and radius r ∈ [1, r_max] we compute the aggregates
  * stored in the paper's per-vertex list `v.R`:
  *
  *  - `bv`     — keyword bit vector of the r-hop ball, `v.BV_r`;
  *  - `ubSup`  — support upper bound `v.ub_sup_r` (max over ball vertices
  *               of the max whole-graph support of incident edges — a safe
  *               upper bound on the support of any edge of any seed
  *               community inside the ball, see DESIGN.md);
  *  - `sigmas` — influential-score upper bounds σ_z(hop(v,r)) for each
  *               grid threshold θ_z, from ONE threshold-truncated MIA
  *               expansion at θ₁ (exact for every θ_z ≥ θ₁).
  *
  * The per-vertex work runs partition-parallel over vertex ranges with the
  * CSR graph and the incident-support array broadcast ("index over graph
  * partitions"); the incident supports themselves come from the
  * distributed triangle-count dataflow in [[repro.truss.Support]].
  */
object Precompute {

  /** Default influence-threshold grid {θ_1 < … < θ_m} (paper Table III
    * values of θ).
    */
  val DefaultThetaGrid: Array[Double] = Array(0.1, 0.2, 0.3)

  /** One row of pre-computed data: the aggregates of `hop(id, r)`. */
  final case class VertexAgg(id: Int, r: Int, bv: Long, ubSup: Int, sigmas: Array[Double])

  /** Distributed max-incident-edge-support per vertex: (id, inc), from the
    * whole-graph edge supports. Vertices without edges are absent.
    */
  def incidentMaxSupport(spark: SparkSession, edges: org.apache.spark.sql.DataFrame): org.apache.spark.sql.DataFrame = {
    val sup = Support.edgeSupports(edges)
    sup
      .select(explode(array(col("src"), col("dst"))).as("id"), col("support"))
      .groupBy("id")
      .agg(max(col("support")).as("inc"))
  }

  /** Collect [[incidentMaxSupport]] into a dense array (0 for isolated). */
  def incidentMaxSupportArray(spark: SparkSession, edges: org.apache.spark.sql.DataFrame, n: Int): Array[Int] = {
    val arr = new Array[Int](n)
    incidentMaxSupport(spark, edges).collect().foreach { r =>
      arr(r.getLong(0).toInt) = r.getLong(1).toInt
    }
    arr
  }

  /** The aggregates of vertex `v` for all radii — the per-vertex unit of
    * work (paper Alg. 2 inner loop), also used directly by tests.
    */
  def localVertexAggs(
      g: GraphData,
      incSup: Array[Int],
      v: Int,
      rMax: Int,
      thetaGrid: Array[Double]): Seq[VertexAgg] = {
    val (ball, dist) = g.hopBall(v, rMax)
    (1 to rMax).map { r =>
      var bv = 0L
      var ub = 0
      val members = scala.collection.mutable.ArrayBuffer[Int]()
      var i = 0
      while (i < ball.length) {
        if (dist(i) <= r) {
          val u = ball(i)
          members += u
          bv |= g.kwMask(u)
          if (incSup(u) > ub) ub = incSup(u)
        }
        i += 1
      }
      val cpp = MIA.influencedCpp(g, members.toArray, thetaGrid.head)
      VertexAgg(v, r, bv, ub, thetaGrid.map(MIA.sigmaAt(cpp, _)))
    }
  }

  /** Run the offline phase as a Spark job over all vertices. */
  def run(
      spark: SparkSession,
      bcG: Broadcast[GraphData],
      bcInc: Broadcast[Array[Int]],
      rMax: Int,
      thetaGrid: Array[Double] = DefaultThetaGrid): Dataset[VertexAgg] = {
    import spark.implicits._
    spark
      .range(bcG.value.n.toLong)
      .repartition(spark.sparkContext.defaultParallelism * 4)
      .mapPartitions { it =>
        val g = bcG.value
        val inc = bcInc.value
        it.flatMap(v => localVertexAggs(g, inc, v.toInt, rMax, thetaGrid))
      }
  }

  /** Convenience: full offline phase from a [[GraphData]] + its edge
    * DataFrame, returning the collected per-vertex aggregates ready for
    * index construction.
    */
  def offline(
      spark: SparkSession,
      g: GraphData,
      edges: org.apache.spark.sql.DataFrame,
      rMax: Int,
      thetaGrid: Array[Double] = DefaultThetaGrid): Array[VertexAgg] = {
    val bcG = spark.sparkContext.broadcast(g)
    val inc = incidentMaxSupportArray(spark, edges, g.n)
    val bcInc = spark.sparkContext.broadcast(inc)
    run(spark, bcG, bcInc, rMax, thetaGrid).collect()
  }
}
