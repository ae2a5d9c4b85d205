package repro.influence

import repro.graph.GraphData

import scala.collection.mutable

/** Maximum Influence Arborescence (MIA) propagation model [13] (paper
  * §II-B) and the influential score of Eq. (5).
  *
  * `upp(u,v)` is the maximum over all u→v paths of the product of edge
  * activation probabilities (Eqs. 1–3); `cpp(g,v) = max_{u∈g} upp(u,v)`
  * with `cpp(g,v)=1` for v ∈ g (Eq. 4); the influenced community `g^Inf`
  * is every vertex with `cpp(g,v) ≥ θ` (Def. 3) and
  * `σ(g) = Σ_{v∈g^Inf} cpp(g,v)` (Eq. 5).
  *
  * Max-product shortest paths are computed with a best-first (Dijkstra-
  * style) expansion on probabilities: because every edge weight is < 1,
  * path probability is monotonically non-increasing along a path, so the
  * first time a vertex is settled its cpp is exact, and the expansion can
  * stop as soon as the best frontier probability drops below θ.
  */
object MIA {

  /** cpp map of the influenced community `g^Inf` of seed set `seed`:
    * vertex → cpp(g, vertex), containing exactly the vertices with
    * cpp ≥ θ (the seeds at 1.0). θ = 0 expands to everything reachable.
    */
  def influencedCpp(g: GraphData, seed: Array[Int], theta: Double): mutable.HashMap[Int, Double] = {
    val cpp = mutable.HashMap[Int, Double]()
    if (seed.isEmpty) return cpp
    // max-heap on probability
    val pq = mutable.PriorityQueue[(Double, Int)]()(Ordering.by(_._1))
    val best = mutable.HashMap[Int, Double]()
    seed.foreach { s => best(s) = 1.0; pq.enqueue((1.0, s)) }
    while (pq.nonEmpty) {
      val (p, u) = pq.dequeue()
      if (!cpp.contains(u) && p >= theta && best(u) == p) {
        cpp(u) = p
        g.foreachNeighbor(u) { (v, w) =>
          val np = p * w
          if (np >= theta && !cpp.contains(v) && np > best.getOrElse(v, 0.0)) {
            best(v) = np
            pq.enqueue((np, v))
          }
        }
      }
    }
    cpp
  }

  /** Influential score σ(g) at threshold θ (Eq. 5). */
  def sigma(g: GraphData, seed: Array[Int], theta: Double): Double =
    sigmaOf(influencedCpp(g, seed, theta))

  /** σ from an already-computed cpp map. */
  def sigmaOf(cpp: mutable.HashMap[Int, Double]): Double = {
    var s = 0.0
    cpp.valuesIterator.foreach(s += _)
    s
  }

  /** σ at a *higher* threshold derived from a cpp map computed at a lower
    * one (exact: `{cpp ≥ θ'} ⊆ {cpp ≥ θ}` for θ' ≥ θ, and cpp values are
    * threshold-independent for retained vertices). Used by the offline
    * phase to get the whole σ_z grid from one expansion.
    */
  def sigmaAt(cpp: mutable.HashMap[Int, Double], thetaZ: Double): Double = {
    var s = 0.0
    cpp.valuesIterator.foreach(p => if (p >= thetaZ) s += p)
    s
  }

  /** Single-source user-to-user propagation probability upp(u, ·) for all
    * vertices with upp ≥ θ (Eq. 3). upp(u,u) = 1 by convention.
    */
  def upp(g: GraphData, u: Int, theta: Double = 0.0): mutable.HashMap[Int, Double] =
    influencedCpp(g, Array(u), theta)
}
