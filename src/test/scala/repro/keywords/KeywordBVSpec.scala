package repro.keywords

import org.scalacheck.Gen
import org.scalatest.funsuite.AnyFunSuite
import repro.MiniChecks

/** Unit + property tests for the keyword bit-vector filter. */
class KeywordBVSpec extends AnyFunSuite with MiniChecks {

  test("bitOf lands in [0, 64) for any keyword") {
    forAllN(Gen.chooseNum(-1000000, 1000000)) { w =>
      val b = KeywordBV.bitOf(w)
      assert(b >= 0 && b < 64)
    }
  }

  test("bitOf is deterministic") {
    (0 until 200).foreach(w => assert(KeywordBV.bitOf(w) == KeywordBV.bitOf(w)))
  }

  test("hashSet of empty set is 0") {
    assert(KeywordBV.hashSet(Nil) == 0L)
  }

  test("hashSet sets exactly the bits of its members") {
    val ks = Seq(1, 5, 9)
    val bv = KeywordBV.hashSet(ks)
    ks.foreach(w => assert((bv & (1L << KeywordBV.bitOf(w))) != 0L))
    assert(java.lang.Long.bitCount(bv) <= ks.size)
  }

  test("hashSet is order-insensitive and duplicate-insensitive") {
    assert(KeywordBV.hashSet(Seq(3, 1, 2)) == KeywordBV.hashSet(Seq(2, 2, 1, 3)))
  }

  test("mayIntersect: shared keyword always admits (no false negatives)") {
    forAllN3(
      Gen.nonEmptyListOf(Gen.chooseNum(0, 200)),
      Gen.listOf(Gen.chooseNum(0, 200)),
      Gen.listOf(Gen.chooseNum(0, 200))) { (shared, a, b) =>
      val bvA = KeywordBV.hashSet(a ++ shared)
      val bvB = KeywordBV.hashSet(b ++ shared)
      assert(KeywordBV.mayIntersect(bvA, bvB))
    }
  }

  test("mayIntersect is false only when sets provably disjoint") {
    forAllN2(Gen.listOf(Gen.chooseNum(0, 500)), Gen.listOf(Gen.chooseNum(0, 500))) { (a, b) =>
      val admits = KeywordBV.mayIntersect(KeywordBV.hashSet(a), KeywordBV.hashSet(b))
      if (!admits) assert(a.toSet.intersect(b.toSet).isEmpty)
    }
  }

  test("Σ=20 (paper default) spreads over enough distinct bits") {
    val bits = (0 until 20).map(KeywordBV.bitOf).toSet
    assert(bits.size >= 10, s"too many collisions in Σ=20: ${bits.size} bits")
  }

  test("Σ=80 (paper max) keeps a useful spread") {
    val bits = (0 until 80).map(KeywordBV.bitOf).toSet
    assert(bits.size >= 40, s"poor spread for Σ=80: ${bits.size}")
  }

  test("OR-aggregation preserves the no-false-negative property") {
    forAllN2(Gen.listOfN(5, Gen.listOf(Gen.chooseNum(0, 100))), Gen.chooseNum(0, 100)) { (sets, q) =>
      val agg = sets.map(KeywordBV.hashSet(_)).foldLeft(0L)(_ | _)
      if (sets.exists(_.contains(q)))
        assert(KeywordBV.mayIntersect(agg, KeywordBV.hashSet(Seq(q))))
    }
  }

  test("mayIntersect with zero vector is always false") {
    forAllN(Gen.listOf(Gen.chooseNum(0, 100))) { a =>
      assert(!KeywordBV.mayIntersect(KeywordBV.hashSet(a), 0L))
      assert(!KeywordBV.mayIntersect(0L, KeywordBV.hashSet(a)))
    }
  }
}
