package repro.core

import repro.graph.GraphData
import repro.index.TreeIndex
import repro.index.TreeIndex.{Inner, Leaf, Node, VertexRef}
import repro.influence.MIA
import repro.keywords.KeywordBV

import scala.collection.mutable

/** Query parameters of TopL-ICDE (paper Def. 4). */
final case class Query(
    keywords: Array[Int],
    k: Int,
    r: Int,
    theta: Double,
    L: Int) {
  require(theta >= 0.0 && theta < 1.0, "θ ∈ [0,1)")
  require(L >= 1 && r >= 1 && k >= 2)
  val queryBv: Long = KeywordBV.hashSet(keywords.toSeq)
}

/** A seed community answer: its center, member vertices, influential score
  * σ(g), and the cpp map of its influenced community g^Inf (kept for the
  * DTopL-ICDE diversity computations).
  */
final case class Community(
    center: Int,
    vertices: Array[Int],
    sigma: Double,
    cpp: Map[Int, Double]) {
  def signature: String = vertices.mkString(",")
  override def toString: String =
    f"Community(center=$center, |V|=${vertices.length}, σ=$sigma%.3f)"
}

/** Which pruning strategies are active — the ablation knob of Fig. 4. */
final case class PruningConfig(
    keyword: Boolean = true,
    support: Boolean = true,
    score: Boolean = true)

/** Counters reported by the ablation study (Fig. 4). */
final class PruneStats {
  var entriesKeywordPruned = 0L   // index entries (Lemma 5)
  var entriesSupportPruned = 0L   // index entries (Lemma 6, safe form)
  var entriesScorePruned = 0L     // index entries (Lemma 7)
  var vertexKeywordPruned = 0L    // r-hop candidates (Lemma 1 via BV_r)
  var vertexSupportPruned = 0L    // r-hop candidates (Lemma 2)
  var vertexScorePruned = 0L      // r-hop candidates (Lemma 4)
  var heapTerminated = 0L         // remaining heap entries cut at termination
  var refined = 0L                // candidates fully refined
  var duplicates = 0L             // candidates equal to an already-kept community
  var noCommunity = 0L            // refinement found no valid seed community
  def totalPruned: Long =
    entriesKeywordPruned + entriesSupportPruned + entriesScorePruned +
      vertexKeywordPruned + vertexSupportPruned + vertexScorePruned + heapTerminated
}

final case class TopLResult(communities: Seq[Community], stats: PruneStats)

/** Online TopL-ICDE processing (paper Algorithm 3): best-first traversal
  * of the tree index with keyword / support / influential-score pruning at
  * both index-entry level (Lemmas 5–7) and r-hop-candidate level (Lemmas
  * 1, 2, 4), followed by exact refinement (seed extraction + MIA score).
  *
  * Support pruning uses the *safe* form `ub_sup < k−2` (the paper's
  * printed `< k` can prune true answers; see DESIGN.md).
  */
object TopLICDE {

  /** Index of the largest grid threshold θ_z ≤ θ, or -1 if θ is below the
    * grid (then no σ_z is a valid upper bound and score pruning at index
    * level is disabled).
    */
  def thetaZIndex(thetaGrid: Array[Double], theta: Double): Int = {
    var z = -1
    var i = 0
    while (i < thetaGrid.length) {
      if (thetaGrid(i) <= theta + 1e-12) z = i
      i += 1
    }
    z
  }

  def run(
      g: GraphData,
      index: Node,
      thetaGrid: Array[Double],
      q: Query,
      cfg: PruningConfig = PruningConfig()): TopLResult = {
    val stats = new PruneStats
    val ri = q.r - 1
    require(q.r <= index.agg.rMax, s"index built for r_max=${index.agg.rMax}, query r=${q.r}")
    val zi = thetaZIndex(thetaGrid, q.theta)

    // current top-L candidates, min-heap by σ
    val top = mutable.PriorityQueue[Community]()(Ordering.by(c => -c.sigma))
    val seen = mutable.HashSet[String]()
    def sigmaL: Double = if (top.size >= q.L) top.head.sigma else Double.NegativeInfinity

    def ubSigma(agg: TreeIndex.Agg): Double =
      if (zi >= 0) agg.sigmas(ri)(zi) else Double.PositiveInfinity

    // index-entry pruning, Lemmas 5/6/7 (and their vertex-level analogues
    // 1/2/4 — a VertexRef's agg is the aggregate of hop(v, r)). `weight` is
    // the number of r-hop candidates the prune removes (subtree size at
    // entry level, 1 at vertex level) so the ablation counters are in
    // candidate units.
    def pruned(agg: TreeIndex.Agg, vertexLevel: Boolean, weight: Long): Boolean = {
      if (cfg.keyword && !KeywordBV.mayIntersect(agg.bv(ri), q.queryBv)) {
        if (vertexLevel) stats.vertexKeywordPruned += weight else stats.entriesKeywordPruned += weight
        true
      } else if (cfg.support && agg.ubSup(ri) < q.k - 2) {
        if (vertexLevel) stats.vertexSupportPruned += weight else stats.entriesSupportPruned += weight
        true
      } else if (cfg.score && top.size >= q.L && ubSigma(agg) <= sigmaL) {
        if (vertexLevel) stats.vertexScorePruned += weight else stats.entriesScorePruned += weight
        true
      } else false
    }

    def refine(v: VertexRef): Unit = {
      stats.refined += 1
      SeedExtract.extract(g, v.id, q.r, q.k, q.keywords) match {
        case None => stats.noCommunity += 1
        case Some(seed) =>
          // dedup BEFORE the σ computation: the same community reached
          // from several of its members is scored once
          val sig = seed.vertices.mkString(",")
          if (!seen.add(sig)) stats.duplicates += 1
          else {
            val cpp = MIA.influencedCpp(g, seed.vertices, q.theta)
            val c = Community(v.id, seed.vertices, MIA.sigmaOf(cpp), cpp.toMap)
            if (top.size < q.L) top.enqueue(c)
            else if (c.sigma > top.head.sigma) { top.dequeue(); top.enqueue(c) }
          }
      }
    }

    val heap = mutable.PriorityQueue[(Double, Node)]()(Ordering.by(_._1))
    heap.enqueue((Double.PositiveInfinity, index))
    var terminated = false
    while (heap.nonEmpty && !terminated) {
      val (key, node) = heap.dequeue()
      if (cfg.score && top.size >= q.L && key <= sigmaL) {
        // every remaining entry's bound is ≤ σ_L: stop (Alg. 3 lines 7–8);
        // count every candidate under the cut-off heap entries
        stats.heapTerminated += node.size.toLong + heap.iterator.map(_._2.size.toLong).sum
        terminated = true
      } else node match {
        case Leaf(_, vs) =>
          vs.foreach { v =>
            // Lemma 1 on the center itself: every seed community centered
            // at v contains v, so a keyword-less center prunes the whole
            // r-hop candidate before any ball/ball-BV work.
            if (cfg.keyword && !KeywordBV.mayIntersect(g.kwMask(v.id), q.queryBv))
              stats.vertexKeywordPruned += 1
            else if (!pruned(v.agg, vertexLevel = true, weight = 1)) refine(v)
          }
        case Inner(_, cs) =>
          cs.foreach { c =>
            if (!pruned(c.agg, vertexLevel = false, weight = c.size.toLong))
              heap.enqueue((ubSigma(c.agg), c))
          }
      }
    }
    TopLResult(top.toSeq.sortBy(c => (-c.sigma, c.signature)), stats)
  }
}
