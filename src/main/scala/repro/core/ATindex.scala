package repro.core

import repro.graph.GraphData
import repro.influence.MIA
import repro.truss.Truss

import scala.collection.mutable

/** The ATindex baseline (paper §VIII-A "Competitors"), built on the
  * state-of-the-art (k,d)-truss community search of Huang & Lakshmanan
  * [22]: offline, index the trussness of every edge/vertex of G; online,
  * filter out vertices whose trussness is below k, extract the r-hop seed
  * community around each surviving (keyword-matching) center, compute ALL
  * the influential scores, and return the best L. It benefits from truss
  * and keyword filtering but has no influence-bound pruning and no
  * best-first index — which is exactly the gap Fig. 2 measures.
  */
object ATindex {

  /** Offline structure: per-vertex trussness (max trussness over incident
    * edges; 0 for isolated vertices).
    */
  final case class Offline(vertexTrussness: Array[Int])

  /** Offline phase: full truss decomposition of G. */
  def offline(g: GraphData): Offline = {
    val adj: Truss.Adj = Array.fill(g.n)(mutable.HashSet[Int]())
    var v = 0
    while (v < g.n) {
      g.foreachNeighbor(v) { (u, _) => adj(v) += u }
      v += 1
    }
    val tn = Truss.trussness(adj)
    val vt = new Array[Int](g.n)
    tn.foreach { case (e, t) =>
      val a = (e >>> 32).toInt; val b = (e & 0xffffffffL).toInt
      if (t > vt(a)) vt(a) = t
      if (t > vt(b)) vt(b) = t
    }
    Offline(vt)
  }

  /** Online phase, exactly as the paper describes the baseline: every
    * center whose trussness reaches k is processed — the keyword-filtered
    * r-hop subgraph is extracted and peeled to its maximal k-truss, and
    * the influential score of every found community is computed. There is
    * no influence-bound pruning and no de-duplication before scoring (the
    * same community reached from each of its members is scored once per
    * member); only the final top-L answer set is de-duplicated. Answers
    * are therefore identical to Algorithm 3's, but the work is not — that
    * gap is what Fig. 2 measures.
    *
    * @return (answers, number of centers whose ball was extracted/peeled)
    */
  def query(g: GraphData, off: Offline, q: Query): (Seq[Community], Long) = {
    var refined = 0L
    val results = mutable.ArrayBuffer[Community]()
    var v = 0
    while (v < g.n) {
      if (off.vertexTrussness(v) >= q.k) {
        refined += 1
        SeedExtract.extract(g, v, q.r, q.k, q.keywords, eagerCenterCheck = false).foreach { seed =>
          val cpp = MIA.influencedCpp(g, seed.vertices, q.theta)
          results += Community(v, seed.vertices, MIA.sigmaOf(cpp), cpp.toMap)
        }
      }
      v += 1
    }
    val seen = mutable.HashSet[String]()
    val answers = results.sortBy(c => (-c.sigma, c.signature))
      .filter(c => seen.add(c.signature))
      .take(q.L)
    (answers.toSeq, refined)
  }
}
