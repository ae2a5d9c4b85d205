package repro.index

import repro.graph.{GraphGen, SocialGraph}
import repro.{SparkSpec, TestGraphs}

/** The distributed offline phase (Spark mapPartitions over broadcast
  * graph) must equal the driver-local per-vertex computation, and the
  * distributed incident-support array must equal the local one.
  */
class PrecomputeSparkSpec extends SparkSpec {

  private lazy val gf = GraphGen.nws(spark, 220, seed = 17L)
  private lazy val gd = SocialGraph.toGraphData(gf)

  test("incidentMaxSupportArray equals the local reference") {
    val dist = Precompute.incidentMaxSupportArray(spark, gf.edges, gd.n)
    assert(dist.toSeq == TestGraphs.localIncSup(gd).toSeq)
  }

  test("distributed run equals local per-vertex aggregates (all radii, all θ_z)") {
    val inc = Precompute.incidentMaxSupportArray(spark, gf.edges, gd.n)
    val bcG = spark.sparkContext.broadcast(gd)
    val bcInc = spark.sparkContext.broadcast(inc)
    val dist = Precompute.run(spark, bcG, bcInc, 2, Precompute.DefaultThetaGrid)
      .collect().map(a => (a.id, a.r) -> a).toMap
    assert(dist.size == gd.n * 2)
    (0 until gd.n).foreach { v =>
      Precompute.localVertexAggs(gd, inc, v, 2, Precompute.DefaultThetaGrid).foreach { want =>
        val got = dist((want.id, want.r))
        assert(got.bv == want.bv)
        assert(got.ubSup == want.ubSup)
        got.sigmas.zip(want.sigmas).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
      }
    }
  }

  test("offline() output feeds TreeIndex.build without gaps") {
    val rows = Precompute.offline(spark, gd, gf.edges, 2)
    val idx = TreeIndex.build(rows)
    assert(TreeIndex.vertices(idx).size == gd.n)
    assert(idx.agg.rMax == 2)
  }
}
