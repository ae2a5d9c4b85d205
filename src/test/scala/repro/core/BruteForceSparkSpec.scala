package repro.core

import org.apache.spark.sql.functions._
import repro.graph.{GraphGen, SocialGraph}
import repro.index.{Precompute, TreeIndex}
import repro.{Oracle, SparkSpec, TestGraphs}

/** Distributed brute-force scan vs local enumeration, the full pipeline on
  * a generated graph, and DuckDB oracle checks of the ranking dataflow.
  */
class BruteForceSparkSpec extends SparkSpec {

  private lazy val gf = GraphGen.nws(spark, 300, GraphGen.KwDist.Uniform, 3, 20, seed = 13L)
  private lazy val gd = SocialGraph.toGraphData(gf)
  private lazy val bcG = spark.sparkContext.broadcast(gd)
  private val q = Query(Array(0, 1, 2, 3, 4), k = 4, r = 2, theta = 0.2, L = 5)

  test("distributed candidate scan equals local center enumeration") {
    val dist = BruteForce.candidates(spark, bcG, q).collect()
      .map(c => c.center -> c.sigma).toMap
    var localCount = 0
    (0 until gd.n).foreach { v =>
      SeedExtract.extract(gd, v, q.r, q.k, q.keywords).foreach { seed =>
        localCount += 1
        val sigma = repro.influence.MIA.sigma(gd, seed.vertices, q.theta)
        assert(math.abs(dist(v) - sigma) < 1e-9, s"center $v")
      }
    }
    assert(dist.size == localCount)
  }

  test("BruteForce.topL equals refTopLSigmas") {
    val got = BruteForce.topL(spark, bcG, q).map(_.sigma)
    val want = TestGraphs.refTopLSigmas(gd, q)
    assert(got.size == want.size)
    got.zip(want).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
  }

  test("full pipeline (Spark offline + index + Alg. 3) equals distributed brute force") {
    val built = Pipeline.build(spark, gf, rMax = 2)
    val res = built.topL(q)
    val want = BruteForce.topL(spark, bcG, q).map(_.sigma)
    assert(res.communities.map(_.sigma).size == want.size)
    res.communities.map(_.sigma).zip(want).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9) }
  }

  test("oracle: top-L ranking of the candidate table matches DuckDB") {
    import spark.implicits._
    val cands = BruteForce.candidates(spark, bcG, q)
      .select(col("center"), round(col("sigma"), 6).as("sigma"))
    val sparkTop = cands.orderBy(col("sigma").desc, col("center")).limit(q.L)
    Oracle.assertEquivalent(
      sparkTop,
      s"""SELECT CAST(center AS INT) AS center, CAST(sigma AS DOUBLE) AS sigma
         |FROM cands ORDER BY CAST(sigma AS DOUBLE) DESC, CAST(center AS INT) LIMIT ${q.L}
         |""".stripMargin,
      "cands" -> cands)
  }

  test("oracle: keyword-eligible center count matches DuckDB") {
    import spark.implicits._
    val vkw = gf.vertices.select(col("id"), explode(col("keywords")).as("kw"))
    val qkw = q.keywords.toSeq.toDF("kw")
    val eligible = vkw.join(qkw, "kw").select("id").distinct()
      .agg(count(lit(1)).as("eligible"))
    Oracle.assertEquivalent(
      eligible,
      "SELECT CAST(count(DISTINCT v.id) AS BIGINT) AS eligible FROM vkw v JOIN qkw q ON v.kw = q.kw",
      "vkw" -> vkw, "qkw" -> qkw)
  }

  test("index answers are identical across rMax used (r <= rMax invariance)") {
    val inc = Precompute.incidentMaxSupportArray(spark, gf.edges, gd.n)
    val bcInc = spark.sparkContext.broadcast(inc)
    val rows2 = Precompute.run(spark, bcG, bcInc, 2).collect()
    val rows3 = Precompute.run(spark, bcG, bcInc, 3).collect()
    val i2 = TreeIndex.build(rows2)
    val i3 = TreeIndex.build(rows3)
    val a = TopLICDE.run(gd, i2, Precompute.DefaultThetaGrid, q).communities.map(_.sigma)
    val b = TopLICDE.run(gd, i3, Precompute.DefaultThetaGrid, q).communities.map(_.sigma)
    assert(a.size == b.size)
    a.zip(b).foreach { case (x, y) => assert(math.abs(x - y) < 1e-9) }
  }

  test("DTopL over pipeline: greedy matches WoP score and beats no-diversity top-L") {
    val built = Pipeline.build(spark, gf, rMax = 2)
    val cands = built.topL(q.copy(L = 3 * q.L)).communities.toIndexedSeq
    if (cands.size > q.L) {
      val wp = DTopL.greedyWP(cands, q.L)
      val wop = DTopL.greedyWoP(cands, q.L)
      assert(math.abs(wp.score - wop.score) < 1e-9)
      val plainTopL = DTopL.diversity(cands.take(q.L))
      assert(wp.score >= plainTopL - 1e-9, "diversified set at least as good as plain top-L")
    }
  }
}
