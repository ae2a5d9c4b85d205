package repro.core

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.graph.SocialGraph
import repro.truss.Truss
import repro.{MiniChecks, TestGraphs}

/** Seed-community extraction vs the four Def.-2 constraints. */
class SeedExtractSpec extends AnyFunSuite with MiniChecks {

  private val q0 = Array(0)

  test("whole clique extracted: K5, k=4, r=1") {
    val g = TestGraphs.clique(5)
    assert(SeedExtract.extract(g, 0, 1, 4, q0).get.vertices.toSeq == Seq(0, 1, 2, 3, 4))
  }

  test("K5 has no 6-truss community") {
    val g = TestGraphs.clique(5)
    assert(SeedExtract.extract(g, 0, 1, 6, q0).isEmpty)
  }

  test("center without a query keyword yields None (Def. 2 bullet 4)") {
    val g = TestGraphs.clique(5)
    assert(SeedExtract.extract(g, 0, 1, 3, Array(99)).isEmpty)
  }

  test("vertices without query keywords are excluded") {
    // K5 where vertex 4 has keyword 1 instead of 0
    val edges = for { u <- 0 until 5; v <- (u + 1) until 5 } yield (u, v)
    val g = SocialGraph.fromEdges(5, edges,
      keywords = Map(0 -> Seq(0), 1 -> Seq(0), 2 -> Seq(0), 3 -> Seq(0), 4 -> Seq(1)))
    assert(SeedExtract.extract(g, 0, 1, 4, q0).get.vertices.toSeq == Seq(0, 1, 2, 3))
  }

  test("bowtie: 3-truss around center 0 is both triangles, pendant dropped") {
    val g = TestGraphs.bowtie()
    assert(SeedExtract.extract(g, 0, 2, 3, q0).get.vertices.toSeq == Seq(0, 1, 2, 3))
  }

  test("bowtie: radius 1 drops vertex 3 (and trussness survives)") {
    val g = TestGraphs.bowtie()
    assert(SeedExtract.extract(g, 0, 1, 3, q0).get.vertices.toSeq == Seq(0, 1, 2))
  }

  test("bowtie: k=4 impossible") {
    val g = TestGraphs.bowtie()
    assert(SeedExtract.extract(g, 0, 2, 4, q0).isEmpty)
  }

  test("radius measured inside g, not G (Def. 2 dist is within the subgraph)") {
    // 0-1-2 short path via keyword-less vertex 1; long path 0-3-4-2.
    val g = SocialGraph.fromEdges(5, Seq((0, 1), (1, 2), (0, 3), (3, 4), (4, 2)),
      keywords = Map(0 -> Seq(0), 1 -> Seq(7), 2 -> Seq(0), 3 -> Seq(0), 4 -> Seq(0)))
    // dist_G(0,2) = 2 but inside g (without vertex 1) it is 3 > r = 2.
    val res = SeedExtract.extract(g, 0, 2, 2, q0).get.vertices.toSeq
    assert(!res.contains(2))
    assert(res.contains(3) && res.contains(4))
  }

  test("k<=2: connected keyword component within radius") {
    val g = SocialGraph.fromEdges(4, Seq((0, 1), (1, 2), (2, 3)),
      keywords = Map(0 -> Seq(0), 1 -> Seq(0), 2 -> Seq(1), 3 -> Seq(0)))
    // vertex 2 lacks keyword 0, so 3 is unreachable inside g.
    assert(SeedExtract.extract(g, 0, 3, 2, q0).get.vertices.toSeq == Seq(0, 1))
  }

  test("k>=3 with an edgeless center yields None, not a singleton") {
    val g = SocialGraph.fromEdges(3, Seq((1, 2)), keywords = Map(0 -> Seq(0), 1 -> Seq(0), 2 -> Seq(0)))
    assert(SeedExtract.extract(g, 0, 2, 3, q0).isEmpty)
  }

  test("property: every extracted community satisfies all Def.-2 constraints") {
    val gen = Gen.zip(Gen.chooseNum(6, 22), Gen.chooseNum(1, 40), Gen.chooseNum(3, 5), Gen.chooseNum(1, 3))
    forAllN(gen, n = 120) { case (n, seed, k, r) =>
      val g = TestGraphs.random(n, 0.35, sigma = 4, kwPerVertex = 2, seed = seed.toLong)
      val query = Array(0, 1)
      (0 until n).foreach { c =>
        SeedExtract.extract(g, c, r, k, query).foreach { community =>
          val members = community.vertices
          assert(members.contains(c), "center included")
          assert(members.sameElements(members.sorted), "sorted output")
          members.foreach(v => assert(g.matchesQuery(v, query), s"keyword constraint at $v"))
          // the community SUBGRAPH (its own edge set, not the induced one)
          val local = members.zipWithIndex.toMap
          val adj: Truss.Adj = Array.fill(members.length)(scala.collection.mutable.HashSet[Int]())
          community.edges.foreach { case (u, v) =>
            assert(local.contains(u) && local.contains(v), "edge endpoints inside community")
            adj(local(u)) += local(v); adj(local(v)) += local(u)
            // every community edge is a real graph edge
            assert(g.neighborsOf(u).contains(v), s"phantom edge ($u,$v)")
          }
          assert(Truss.isKTruss(adj, k), s"k-truss constraint, k=$k")
          val d = Truss.bfsDist(adj, local(c))
          d.foreach(x => assert(x <= r, s"radius constraint r=$r"))
        }
      }
    }
  }

  test("property: extraction is deterministic") {
    forAllN2(Gen.chooseNum(6, 15), Gen.chooseNum(1, 20), n = 30) { (n, seed) =>
      val g = TestGraphs.random(n, 0.4, seed = seed.toLong)
      (0 until n).foreach { c =>
        val a = SeedExtract.extract(g, c, 2, 3, Array(0, 1, 2))
        val b = SeedExtract.extract(g, c, 2, 3, Array(0, 1, 2))
        assert(a.map(_.vertices.toSeq) == b.map(_.vertices.toSeq))
        assert(a.map(_.edges.toSeq) == b.map(_.edges.toSeq))
      }
    }
  }
}
