package repro.index

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.core.SeedExtract
import repro.influence.MIA
import repro.keywords.KeywordBV
import repro.truss.Truss
import repro.{MiniChecks, TestGraphs}

/** Validity of the per-vertex offline aggregates (paper Alg. 2) — these
  * are what make the pruning lemmas *safe*, so each bound is checked
  * against exhaustively computed truth on small random graphs.
  */
class PrecomputeLocalSpec extends AnyFunSuite with MiniChecks {

  private val grid = Precompute.DefaultThetaGrid

  test("BV_r is the OR of ball members' bit vectors") {
    forAllN2(Gen.chooseNum(5, 20), Gen.chooseNum(1, 30), n = 40) { (n, seed) =>
      val g = TestGraphs.random(n, 0.3, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      (0 until n).foreach { v =>
        val dist = TestGraphs.refDist(g, v)
        Precompute.localVertexAggs(g, inc, v, 3, grid).foreach { row =>
          val expected = dist.collect { case (u, d) if d <= row.r => g.kwMask(u) }
            .foldLeft(0L)(_ | _)
          assert(row.bv == expected, s"BV_r mismatch v=$v r=${row.r}")
        }
      }
    }
  }

  test("keyword pruning via BV_r is safe: a matching community is never filtered") {
    forAllN2(Gen.chooseNum(6, 18), Gen.chooseNum(1, 30), n = 40) { (n, seed) =>
      val g = TestGraphs.random(n, 0.35, sigma = 5, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      val query = Array(0, 1)
      val qbv = KeywordBV.hashSet(query.toSeq)
      (0 until n).foreach { v =>
        Precompute.localVertexAggs(g, inc, v, 2, grid).foreach { row =>
          SeedExtract.extract(g, v, row.r, 3, query).foreach { _ =>
            assert(KeywordBV.mayIntersect(row.bv, qbv),
              s"BV pruning would kill a real community at v=$v r=${row.r}")
          }
        }
      }
    }
  }

  test("ub_sup_r upper-bounds the support of every edge of every seed community in the ball") {
    forAllN2(Gen.chooseNum(6, 16), Gen.chooseNum(1, 40), n = 60) { (n, seed) =>
      val g = TestGraphs.random(n, 0.4, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      (0 until n).foreach { v =>
        Precompute.localVertexAggs(g, inc, v, 2, grid).foreach { row =>
          // any seed community within the ball: its edges' supports (in the
          // community!) are <= their supports in G <= ub_sup_r
          SeedExtract.extract(g, v, row.r, 3, Array(0, 1, 2, 3, 4)).foreach { community =>
            val members = community.vertices
            val local = members.zipWithIndex.toMap
            val adj: Truss.Adj = Array.fill(members.length)(scala.collection.mutable.HashSet[Int]())
            community.edges.foreach { case (u, w) =>
              adj(local(u)) += local(w); adj(local(w)) += local(u)
            }
            Truss.supports(adj).values.foreach(s => assert(s <= row.ubSup))
          }
        }
      }
    }
  }

  test("σ_z(hop(v,r)) upper-bounds σ(g) for every seed community g in the ball (Lemma 4 basis)") {
    forAllN2(Gen.chooseNum(6, 16), Gen.chooseNum(1, 40), n = 50) { (n, seed) =>
      val g = TestGraphs.random(n, 0.4, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      val query = Array(0, 1)
      (0 until n).foreach { v =>
        Precompute.localVertexAggs(g, inc, v, 2, grid).foreach { row =>
          SeedExtract.extract(g, v, row.r, 3, query).foreach { community =>
            grid.zipWithIndex.foreach { case (tz, z) =>
              val actual = MIA.sigma(g, community.vertices, tz)
              assert(row.sigmas(z) >= actual - 1e-9,
                s"σ bound violated: v=$v r=${row.r} θ_z=$tz bound=${row.sigmas(z)} actual=$actual")
            }
          }
        }
      }
    }
  }

  test("σ_z equals σ of the full ball as seed (definition of the bound)") {
    forAllN2(Gen.chooseNum(5, 14), Gen.chooseNum(1, 30), n = 30) { (n, seed) =>
      val g = TestGraphs.random(n, 0.35, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      (0 until n).foreach { v =>
        val dist = TestGraphs.refDist(g, v)
        Precompute.localVertexAggs(g, inc, v, 2, grid).foreach { row =>
          val ball = dist.collect { case (u, d) if d <= row.r => u }.toArray
          grid.zipWithIndex.foreach { case (tz, z) =>
            assert(math.abs(row.sigmas(z) - MIA.sigma(g, ball, tz)) < 1e-9)
          }
        }
      }
    }
  }

  test("σ_z grid is antitone in z") {
    forAllN2(Gen.chooseNum(5, 20), Gen.chooseNum(1, 20), n = 20) { (n, seed) =>
      val g = TestGraphs.random(n, 0.3, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      (0 until n).foreach { v =>
        Precompute.localVertexAggs(g, inc, v, 3, grid).foreach { row =>
          row.sigmas.sliding(2).foreach(p => if (p.length == 2) assert(p(0) >= p(1) - 1e-12))
        }
      }
    }
  }

  test("aggregates are monotone in r (bigger ball, bigger bounds)") {
    forAllN2(Gen.chooseNum(5, 20), Gen.chooseNum(1, 20), n = 20) { (n, seed) =>
      val g = TestGraphs.random(n, 0.3, seed = seed.toLong)
      val inc = TestGraphs.localIncSup(g)
      (0 until n).foreach { v =>
        val rows = Precompute.localVertexAggs(g, inc, v, 3, grid).sortBy(_.r)
        rows.sliding(2).foreach {
          case Seq(a, b) =>
            assert((a.bv | b.bv) == b.bv)
            assert(b.ubSup >= a.ubSup)
            a.sigmas.zip(b.sigmas).foreach { case (x, y) => assert(y >= x - 1e-9) }
          case _ =>
        }
      }
    }
  }
}
