package repro

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.graph.SocialGraph
import repro.index.{Precompute, TreeIndex}
import repro.influence.MIA
import repro.truss.{KCore, Truss}

/** Degenerate and boundary inputs across the stack. */
class EdgeCasesSpec extends AnyFunSuite {

  private val grid = Precompute.DefaultThetaGrid

  test("truss: supports/peel/trussness on an edgeless graph") {
    val adj = Truss.adjacency(4, Nil)
    assert(Truss.supports(adj).isEmpty)
    Truss.kTrussPeel(adj, 4)
    assert(Truss.trussness(adj).isEmpty)
  }

  test("truss: single edge has support 0, trussness 2") {
    val adj = Truss.adjacency(2, Seq((0, 1)))
    assert(Truss.supports(adj)(Truss.key(0, 1)) == 0)
    assert(Truss.trussness(adj)(Truss.key(0, 1)) == 2)
  }

  test("kcore: k = 0 and k = 1 keep all edges") {
    val g = TestGraphs.bowtie()
    Seq(0, 1).foreach { k =>
      val adj = TestGraphs.adjOf(g)
      KCore.kCorePeel(adj, k)
      assert(TestGraphs.edgeSet(adj).size == 6)
    }
  }

  test("MIA: threshold boundary is inclusive (cpp >= θ, Def. 3)") {
    // path 0→1 with weight exactly 0.5; θ = 0.5 must keep vertex 1
    val g = SocialGraph.fromEdges(2, Seq((0, 1)), w = 0.5)
    val cpp = MIA.influencedCpp(g, Array(0), 0.5)
    assert(cpp.keySet == Set(0, 1))
  }

  test("MIA: disconnected vertex influences only itself") {
    val g = SocialGraph.fromEdges(3, Seq((1, 2)))
    val cpp = MIA.influencedCpp(g, Array(0), 0.1)
    assert(cpp.keySet == Set(0))
    assert(MIA.sigmaOf(cpp) == 1.0)
  }

  test("seed extraction with duplicate query keywords") {
    val g = TestGraphs.clique(4)
    val a = SeedExtract.extract(g, 0, 1, 3, Array(0, 0, 0))
    val b = SeedExtract.extract(g, 0, 1, 3, Array(0))
    assert(a.get.vertices.toSeq == b.get.vertices.toSeq)
  }

  test("seed extraction with r far beyond the diameter equals full-graph truss") {
    val g = TestGraphs.clique(5)
    val s = SeedExtract.extract(g, 0, 100, 4, Array(0))
    assert(s.get.vertices.toSeq == Seq(0, 1, 2, 3, 4))
  }

  test("single-vertex graph: precompute, index, and query run (k<=2 singleton)") {
    val g = SocialGraph.fromEdges(1, Nil, keywords = Map(0 -> Seq(0)))
    val rows = (0 until 1).flatMap(v =>
      Precompute.localVertexAggs(g, Array(0), v, 2, grid)).toArray
    val idx = TreeIndex.build(rows)
    val res = TopLICDE.run(g, idx, grid, Query(Array(0), 2, 1, 0.2, 1))
    assert(res.communities.map(_.vertices.toSeq) == Seq(Seq(0)))
    assert(res.communities.head.sigma == 1.0)
    // k >= 3: no community on an edgeless graph
    assert(TopLICDE.run(g, idx, grid, Query(Array(0), 3, 1, 0.2, 1)).communities.isEmpty)
  }

  test("DTopL selectors with L = 0 return empty") {
    val c = Community(0, Array(0), 1.0, Map(0 -> 1.0))
    assert(DTopL.greedyWP(IndexedSeq(c), 0).selected.isEmpty)
    assert(DTopL.greedyWoP(IndexedSeq(c), 0).selected.isEmpty)
    assert(DTopL.optimal(IndexedSeq(c), 0).selected.isEmpty)
  }

  test("TreeIndex.combine of a single aggregate is the identity") {
    val agg = TreeIndex.Agg(Array(5L), Array(3), Array(Array(1.0, 0.5)))
    val c = TreeIndex.combine(Seq(agg))
    assert(c.bv.toSeq == agg.bv.toSeq && c.ubSup.toSeq == agg.ubSup.toSeq)
    assert(c.sigmas(0).toSeq == agg.sigmas(0).toSeq)
  }

  test("influential-score pruning disabled below the θ grid (thetaZIndex = -1)") {
    assert(TopLICDE.thetaZIndex(grid, 0.0) == -1)
    assert(TopLICDE.thetaZIndex(Array.empty[Double], 0.5) == -1)
  }

  test("PruneStats.totalPruned sums every counter") {
    val s = new PruneStats
    s.entriesKeywordPruned = 1; s.entriesSupportPruned = 2; s.entriesScorePruned = 3
    s.vertexKeywordPruned = 4; s.vertexSupportPruned = 5; s.vertexScorePruned = 6
    s.heapTerminated = 7
    assert(s.totalPruned == 28)
  }

  test("GraphData.hopBall on a ring wraps both directions") {
    val n = 6
    val g = SocialGraph.fromEdges(n, (0 until n).map(i => (i, (i + 1) % n)))
    val (ball, dist) = g.hopBall(0, 2)
    assert(ball.toSet == Set(0, 1, 2, 4, 5))
    assert(dist.max == 2)
  }

  test("Community.signature distinguishes different vertex sets only") {
    val a = Community(0, Array(1, 2, 3), 5.0, Map.empty)
    val b = Community(9, Array(1, 2, 3), 5.0, Map.empty)
    val c = Community(0, Array(1, 2, 4), 5.0, Map.empty)
    assert(a.signature == b.signature)
    assert(a.signature != c.signature)
  }
}
