package repro.core

import repro.graph.GraphData
import repro.truss.Truss

import scala.collection.mutable

/** Extraction of the seed community of a candidate center (paper Def. 2,
  * used at Alg. 3 line 12 and by both baselines).
  *
  * Given center v_q, radius r, support k and query keywords Q, the seed
  * community is the maximal subgraph g ⊆ hop(v_q, r) such that
  *  (1) v_q ∈ g, (2) every vertex is within r hops of v_q *in g*,
  *  (3) g is a k-truss, (4) every vertex matches ≥ 1 query keyword.
  *
  * The maximal k-truss containing v_q is unique (k-trusses are closed
  * under union), so each center yields at most one candidate; removing
  * radius-violating vertices can break trussness and vice versa, so we
  * iterate peel → component(v_q) → radius filter to a fixpoint (each
  * round strictly shrinks the vertex set, so it terminates).
  *
  * For k ≥ 3 the center must keep at least one edge in the truss — a
  * community is a group, not an isolated user; for k ≤ 2 (vacuous truss
  * constraint) the community is the keyword-satisfying connected
  * component of radius r around the center.
  */
object SeedExtract {

  /** A seed community as a *subgraph*: its (sorted) global vertex ids and
    * its undirected edge set (canonical u < v). The edge set matters: a
    * maximal k-truss is an edge subgraph — the induced graph on its vertex
    * set may contain peeled-away low-support edges that are NOT part of
    * the community.
    */
  final case class Seed(vertices: Array[Int], edges: Array[(Int, Int)])

  /** @return the seed community of `center`, or None if none exists.
    *
    * @param eagerCenterCheck when true (the TopL-ICDE path), a center
    *        without query keywords returns None immediately (Def. 2 makes
    *        the community impossible). The ATindex baseline passes false:
    *        the paper's baseline extracts and peels the keyword-filtered
    *        ball around every trussness-eligible center before discovering
    *        the center itself disqualifies — that cost is part of what
    *        Fig. 2 measures.
    */
  def extract(
      g: GraphData,
      center: Int,
      r: Int,
      k: Int,
      query: Array[Int],
      eagerCenterCheck: Boolean = true): Option[Seed] = {
    val centerOk = g.matchesQuery(center, query)
    if (eagerCenterCheck && !centerOk) return None
    val (ball, dist) = g.hopBall(center, r)
    // keyword-filtered ball (Lemma 1 applied exactly, per Def. 2 bullet 4)
    val kept = mutable.ArrayBuffer[Int]()
    var i = 0
    while (i < ball.length) {
      if (g.matchesQuery(ball(i), query)) kept += ball(i)
      i += 1
    }
    val global = kept.toArray
    val localOf = new mutable.HashMap[Int, Int]()
    global.zipWithIndex.foreach { case (v, j) => localOf(v) = j }
    val adj: Truss.Adj = Array.fill(global.length)(mutable.HashSet[Int]())
    var j = 0
    while (j < global.length) {
      val v = global(j)
      g.foreachNeighbor(v) { (u, _) =>
        localOf.get(u).foreach { lu => if (lu != j) { adj(j) += lu; adj(lu) += j } }
      }
      j += 1
    }
    if (!centerOk) {
      // baseline path: do the representative peeling work on the filtered
      // ball, then report that no community centered here exists
      Truss.kTrussPeel(adj, k)
      return None
    }
    val c = localOf(center)
    var changed = true
    while (changed) {
      changed = false
      Truss.kTrussPeel(adj, k)
      if (k >= 3 && adj(c).isEmpty) return None
      val comp = Truss.componentOf(adj, c)
      // drop everything outside the center's component
      adj.indices.foreach { v =>
        if (!comp.contains(v) && adj(v).nonEmpty) {
          adj(v).foreach(u => adj(u) -= v)
          adj(v).clear()
          changed = true
        }
      }
      // enforce radius within the current subgraph g (Def. 2 bullet 2)
      val d = Truss.bfsDist(adj, c)
      comp.foreach { v =>
        if (v != c && d(v) > r) {
          adj(v).foreach(u => adj(u) -= v)
          adj(v).clear()
          changed = true
        }
      }
    }
    if (k >= 3 && adj(c).isEmpty) None
    else {
      val comp = Truss.componentOf(adj, c)
      val verts = comp.toArray.map(global).sorted
      val edges = (for {
        u <- comp.iterator
        v <- adj(u).iterator
        if u < v
      } yield {
        val (a, b) = (global(u), global(v))
        if (a < b) (a, b) else (b, a)
      }).toArray.sorted
      Some(Seed(verts, edges))
    }
  }
}
