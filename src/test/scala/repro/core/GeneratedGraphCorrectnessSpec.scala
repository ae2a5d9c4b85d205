package repro.core

import repro.graph.GraphGen
import repro.graph.GraphGen.KwDist
import repro.graph.SocialGraph
import repro.{SparkSpec, TestGraphs}

/** End-to-end exactness of the full pipeline (Spark offline + tree index +
  * Algorithm 3) against ground truth on EVERY generator family — the
  * clique-overlap graphs exercise truss structure (shared cliques, many
  * duplicate communities) that random ER graphs do not.
  */
class GeneratedGraphCorrectnessSpec extends SparkSpec {

  private def check(name: String, gf: SocialGraph.GraphFrames, qs: Seq[Query]): Unit = {
    val built = Pipeline.build(spark, gf, rMax = 2)
    val off = ATindex.offline(built.g)
    qs.foreach { q =>
      val want = TestGraphs.refTopLSigmas(built.g, q)
      val topl = built.topL(q).communities.map(_.sigma)
      assert(topl.size == want.size, s"$name/$q count")
      topl.zip(want).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"$name/$q") }
      val (at, _) = ATindex.query(built.g, off, q)
      assert(at.map(_.sigma).size == want.size, s"$name/$q ATindex count")
      at.map(_.sigma).zip(want).foreach { case (a, b) => assert(math.abs(a - b) < 1e-9, s"$name/$q ATindex") }
    }
  }

  private val queries = Seq(
    Query(Array(0, 1, 2, 3, 4), 4, 2, 0.2, 5),
    Query(Array(0, 5, 9), 3, 2, 0.1, 3),
    Query(Array(2, 7), 3, 1, 0.3, 8))

  test("pipeline == ground truth on DBLP-like (clique-overlap, dense triangles)") {
    check("dblp", GraphGen.dblpLike(spark, 600, seed = 3L), queries)
  }

  test("pipeline == ground truth on Amazon-like (sparser cliques)") {
    check("amazon", GraphGen.amazonLike(spark, 600, seed = 5L), queries)
  }

  test("pipeline == ground truth on NWS Uniform") {
    check("uni", GraphGen.nws(spark, 600, KwDist.Uniform, seed = 7L), queries)
  }

  test("pipeline == ground truth on NWS Gaussian") {
    check("gau", GraphGen.nws(spark, 600, KwDist.Gaussian, seed = 9L), queries)
  }

  test("pipeline == ground truth on NWS Zipf") {
    check("zipf", GraphGen.nws(spark, 600, KwDist.Zipf, seed = 11L), queries)
  }

  test("dTopL over a generated graph: WP == WoP and within (1-1/e) of Optimal") {
    val built = Pipeline.build(spark, GraphGen.dblpLike(spark, 600, seed = 13L), rMax = 2)
    val q = Query(Array(0, 1, 2, 3, 4), 3, 2, 0.2, 3)
    val cands = built.topL(q.copy(L = 12)).communities.toIndexedSeq
    if (cands.size >= 4) {
      val wp = DTopL.greedyWP(cands, q.L)
      val wop = DTopL.greedyWoP(cands, q.L)
      val opt = DTopL.optimal(cands, q.L)
      assert(math.abs(wp.score - wop.score) < 1e-9)
      assert(wp.score >= (1 - 1 / math.E) * opt.score - 1e-9)
      assert(wp.score <= opt.score + 1e-9)
    }
  }
}
