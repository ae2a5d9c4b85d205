package repro.truss

import scala.collection.mutable

/** k-core peeling [23] — the structural-cohesiveness baseline used by the
  * paper's case study (Fig. 5): the maximal subgraph in which every vertex
  * has degree ≥ k.
  */
object KCore {

  /** Peel `adj` *in place* to its maximal k-core (possibly empty). */
  def kCorePeel(adj: Truss.Adj, k: Int): Unit = {
    val queue = mutable.Queue[Int]()
    val removed = new Array[Boolean](adj.length)
    adj.indices.foreach(v => if (adj(v).size < k) queue += v)
    while (queue.nonEmpty) {
      val v = queue.dequeue()
      if (!removed(v)) {
        removed(v) = true
        val ns = adj(v).toArray
        adj(v).clear()
        ns.foreach { u =>
          adj(u) -= v
          if (!removed(u) && adj(u).size < k) queue += u
        }
      }
    }
  }

  /** The k-core community around `center`: peel to the maximal k-core and
    * take the connected component containing `center`. Empty if the center
    * itself was peeled away.
    */
  def kCoreCommunity(adjIn: Truss.Adj, center: Int, k: Int): Set[Int] = {
    val adj = Truss.copy(adjIn)
    kCorePeel(adj, k)
    if (adj(center).isEmpty) Set.empty
    else Truss.componentOf(adj, center).toSet
  }
}
