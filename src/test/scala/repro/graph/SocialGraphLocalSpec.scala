package repro.graph

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.core.Query
import repro.{MiniChecks, TestGraphs}

/** GraphData invariants and local BFS vs reference. */
class SocialGraphLocalSpec extends AnyFunSuite with MiniChecks {

  test("fromEdges builds symmetric structure with per-direction weights") {
    val g = SocialGraph.fromEdges(3, Seq((0, 1), (1, 2)),
      directedWeights = Map((0, 1) -> 0.55, (1, 0) -> 0.51, (1, 2) -> 0.59, (2, 1) -> 0.52))
    var w01 = 0.0; var w10 = 0.0
    g.foreachNeighbor(0) { (u, w) => if (u == 1) w01 = w }
    g.foreachNeighbor(1) { (u, w) => if (u == 0) w10 = w }
    assert(w01 == 0.55 && w10 == 0.51)
    assert(g.numUndirectedEdges == 2)
  }

  test("fromEdges rejects self loops") {
    intercept[IllegalArgumentException] { SocialGraph.fromEdges(2, Seq((1, 1))) }
  }

  test("degree and neighborsOf are consistent") {
    forAllN2(Gen.chooseNum(3, 20), Gen.chooseNum(1, 20), n = 30) { (n, seed) =>
      val g = TestGraphs.random(n, 0.4, seed = seed.toLong)
      (0 until n).foreach { v =>
        assert(g.degree(v) == g.neighborsOf(v).length)
        assert(g.neighborsOf(v).toSeq == g.neighborsOf(v).sorted.toSeq, "adjacency sorted")
      }
    }
  }

  test("property: hopBall matches reference BFS distances for r = 0..3") {
    forAllN2(Gen.chooseNum(3, 25), Gen.chooseNum(1, 30), n = 40) { (n, seed) =>
      val g = TestGraphs.random(n, 0.25, seed = seed.toLong)
      (0 until n).foreach { v =>
        val ref = TestGraphs.refDist(g, v)
        (0 to 3).foreach { r =>
          val (ball, dist) = g.hopBall(v, r)
          val want = ref.filter(_._2 <= r)
          assert(ball.toSet == want.keySet, s"ball($v,$r)")
          ball.zip(dist).foreach { case (u, d) => assert(d == ref(u)) }
        }
      }
    }
  }

  test("hopBall(v, 0) is just the center") {
    val g = TestGraphs.bowtie()
    val (ball, dist) = g.hopBall(2, 0)
    assert(ball.toSeq == Seq(2) && dist.toSeq == Seq(0))
  }

  test("matchesQuery is exact set intersection") {
    forAllN3(Gen.chooseNum(3, 12), Gen.chooseNum(1, 20), Gen.listOf(Gen.chooseNum(0, 10)), n = 40) {
      (n, seed, q) =>
        val g = TestGraphs.random(n, 0.3, sigma = 8, kwPerVertex = 3, seed = seed.toLong)
        val query = q.toArray
        (0 until n).foreach { v =>
          val want = g.keywords(v).toSet.intersect(query.toSet).nonEmpty
          assert(g.matchesQuery(v, query) == want)
        }
    }
  }

  test("kwMask covers exactly the vertex keywords' bits") {
    forAllN2(Gen.chooseNum(2, 15), Gen.chooseNum(1, 20), n = 20) { (n, seed) =>
      val g = TestGraphs.random(n, 0.3, seed = seed.toLong)
      (0 until n).foreach { v =>
        assert(g.kwMask(v) == repro.keywords.KeywordBV.hashSet(g.keywords(v).toSeq))
      }
    }
  }

  test("Query validates its parameters") {
    intercept[IllegalArgumentException](Query(Array(0), 2, 1, 1.0, 1))   // θ = 1
    intercept[IllegalArgumentException](Query(Array(0), 2, 1, -0.1, 1))  // θ < 0
    intercept[IllegalArgumentException](Query(Array(0), 2, 1, 0.2, 0))   // L = 0
    intercept[IllegalArgumentException](Query(Array(0), 2, 0, 0.2, 1))   // r = 0
    intercept[IllegalArgumentException](Query(Array(0), 1, 1, 0.2, 1))   // k = 1
  }

  test("Query bit vector hashes its keywords") {
    val q = Query(Array(1, 2, 3), 3, 2, 0.2, 5)
    assert(q.queryBv == repro.keywords.KeywordBV.hashSet(Seq(1, 2, 3)))
  }
}
