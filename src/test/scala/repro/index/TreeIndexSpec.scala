package repro.index

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.index.TreeIndex.{Inner, Leaf, Node}
import repro.{MiniChecks, TestGraphs}

/** Tree-index construction invariants (paper §V-B). */
class TreeIndexSpec extends AnyFunSuite with MiniChecks {

  private def rowsFor(n: Int, seed: Long, rMax: Int = 2): Array[Precompute.VertexAgg] = {
    val g = TestGraphs.random(n, 0.3, seed = seed)
    val inc = TestGraphs.localIncSup(g)
    (0 until g.n).flatMap(v =>
      Precompute.localVertexAggs(g, inc, v, rMax, Precompute.DefaultThetaGrid)).toArray
  }

  private def checkAggs(node: Node): Unit = node match {
    case Leaf(agg, vs) =>
      val c = TreeIndex.combine(vs.map(_.agg))
      assert(agg.bv.sameElements(c.bv))
      assert(agg.ubSup.sameElements(c.ubSup))
      agg.sigmas.zip(c.sigmas).foreach { case (a, b) => assert(a.sameElements(b)) }
    case Inner(agg, cs) =>
      val c = TreeIndex.combine(cs.map(_.agg))
      assert(agg.bv.sameElements(c.bv))
      assert(agg.ubSup.sameElements(c.ubSup))
      agg.sigmas.zip(c.sigmas).foreach { case (a, b) => assert(a.sameElements(b)) }
      cs.foreach(checkAggs)
  }

  test("every vertex appears exactly once in the index") {
    val rows = rowsFor(60, 3L)
    val idx = TreeIndex.build(rows, fanout = 4)
    val ids = TreeIndex.vertices(idx).map(_.id).toSeq
    assert(ids.sorted == (0 until 60))
  }

  test("aggregates are the OR/max of children at every level") {
    val rows = rowsFor(80, 5L)
    checkAggs(TreeIndex.build(rows, fanout = 4))
  }

  test("root aggregate dominates every vertex aggregate") {
    val rows = rowsFor(50, 7L)
    val idx = TreeIndex.build(rows, fanout = 8)
    TreeIndex.vertices(idx).foreach { v =>
      (0 until v.agg.rMax).foreach { r =>
        assert((idx.agg.bv(r) | v.agg.bv(r)) == idx.agg.bv(r))
        assert(idx.agg.ubSup(r) >= v.agg.ubSup(r))
        v.agg.sigmas(r).zip(idx.agg.sigmas(r)).foreach { case (s, rs) => assert(rs >= s) }
      }
    }
  }

  test("height is logarithmic in fanout") {
    val rows = rowsFor(100, 9L)
    assert(TreeIndex.height(TreeIndex.build(rows, fanout = 100)) == 1)
    val h4 = TreeIndex.height(TreeIndex.build(rows, fanout = 4))
    assert(h4 >= 3 && h4 <= 6)
  }

  test("single-vertex graph builds a one-leaf index") {
    val rows = rowsFor(1, 11L)
    val idx = TreeIndex.build(rows)
    assert(idx.isInstanceOf[Leaf])
    assert(TreeIndex.vertices(idx).size == 1)
  }

  test("build rejects vertices with missing radii") {
    val rows = rowsFor(10, 13L)
    intercept[IllegalArgumentException] {
      TreeIndex.build(rows.filterNot(r => r.id == 3 && r.r == 2))
    }
  }

  test("property: index over random graphs keeps all per-radius bounds consistent") {
    forAllN2(Gen.chooseNum(5, 60), Gen.chooseNum(1, 20), n = 20) { (n, seed) =>
      val rows = rowsFor(n, seed.toLong)
      checkAggs(TreeIndex.build(rows, fanout = 3))
    }
  }
}
