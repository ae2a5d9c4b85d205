package repro

import repro.graph.{GraphData, SocialGraph}
import repro.truss.Truss

import scala.collection.mutable
import scala.util.Random

/** Shared fixtures and independent reference implementations used to
  * validate the production algorithms. References are deliberately naive
  * (from-scratch recomputation, exhaustive enumeration) so they share no
  * code path with the implementations under test.
  */
object TestGraphs {

  /** Deterministic Erdős–Rényi-ish random graph with random keyword sets
    * and Uniform[0.5, 0.6) per-direction weights.
    */
  def random(
      n: Int,
      edgeProb: Double,
      sigma: Int = 8,
      kwPerVertex: Int = 2,
      seed: Long = 1L): GraphData = {
    val rnd = new Random(seed)
    val edges = for {
      u <- 0 until n
      v <- (u + 1) until n
      if rnd.nextDouble() < edgeProb
    } yield (u, v)
    val dw = edges.flatMap { case (u, v) =>
      Seq((u, v) -> (0.5 + 0.1 * rnd.nextDouble()), (v, u) -> (0.5 + 0.1 * rnd.nextDouble()))
    }.toMap
    val kws = (0 until n).map { v =>
      v -> Seq.fill(kwPerVertex)(rnd.nextInt(sigma)).distinct
    }.toMap
    SocialGraph.fromEdges(n, edges, kws, directedWeights = dw)
  }

  /** A small hand graph: two triangles sharing an edge plus a pendant.
    *
    * 0-1, 0-2, 1-2, 1-3, 2-3, 3-4 — edge (1,2) is in 2 triangles.
    */
  def bowtie(): GraphData =
    SocialGraph.fromEdges(5, Seq((0, 1), (0, 2), (1, 2), (1, 3), (2, 3), (3, 4)),
      keywords = (0 until 5).map(v => v -> Seq(0)).toMap)

  /** Complete graph K_n, all weights w, all vertices keyword {0}. */
  def clique(n: Int, w: Double = 0.5): GraphData =
    SocialGraph.fromEdges(n,
      for { u <- 0 until n; v <- (u + 1) until n } yield (u, v),
      keywords = (0 until n).map(v => v -> Seq(0)).toMap, w = w)

  /** Adjacency sets of the undirected structure of g. */
  def adjOf(g: GraphData): Truss.Adj = {
    val adj: Truss.Adj = Array.fill(g.n)(mutable.HashSet[Int]())
    (0 until g.n).foreach { v => g.foreachNeighbor(v) { (u, _) => adj(v) += u } }
    adj
  }

  /** Undirected canonical edge set of an adjacency structure. */
  def edgeSet(adj: Truss.Adj): Set[(Int, Int)] =
    (for { u <- adj.indices; v <- adj(u); if u < v } yield (u, v)).toSet

  /** Reference maximal k-truss: recompute ALL supports from scratch and
    * delete every under-supported edge, repeat to fixpoint.
    */
  def refKTruss(adjIn: Truss.Adj, k: Int): Truss.Adj = {
    val adj = Truss.copy(adjIn)
    var changed = true
    while (changed) {
      changed = false
      val bad = for {
        u <- adj.indices
        v <- adj(u).toSeq
        if u < v && (adj(u) & adj(v)).size < k - 2
      } yield (u, v)
      if (bad.nonEmpty) {
        changed = true
        bad.foreach { case (u, v) => adj(u) -= v; adj(v) -= u }
      }
    }
    adj
  }

  /** Reference upp(u, ·): exhaustive simple-path enumeration (small graphs
    * only) of the max product of directed weights.
    */
  def refUpp(g: GraphData, source: Int): Map[Int, Double] = {
    val best = mutable.HashMap[Int, Double](source -> 1.0)
    def dfs(v: Int, p: Double, visited: Set[Int]): Unit =
      g.foreachNeighbor(v) { (u, w) =>
        if (!visited.contains(u)) {
          val np = p * w
          if (np > best.getOrElse(u, 0.0)) best(u) = np
          dfs(u, np, visited + u)
        }
      }
    dfs(source, 1.0, Set(source))
    best.toMap
  }

  /** Max incident whole-graph edge support per vertex (local reference for
    * [[repro.index.Precompute.incidentMaxSupportArray]]).
    */
  def localIncSup(g: GraphData): Array[Int] = {
    val adj = adjOf(g)
    val sup = Truss.supports(adj)
    val inc = new Array[Int](g.n)
    sup.foreach { case (e, s) =>
      val a = (e >>> 32).toInt; val b = (e & 0xffffffffL).toInt
      if (s > inc(a)) inc(a) = s
      if (s > inc(b)) inc(b) = s
    }
    inc
  }

  /** Ground-truth TopL-ICDE by exhaustive center enumeration (no index, no
    * pruning, driver-local): the multiset of the L highest influential
    * scores over deduplicated seed communities.
    */
  def refTopLSigmas(g: GraphData, q: repro.core.Query): Seq[Double] = {
    val bySig = mutable.HashMap[String, Double]()
    (0 until g.n).foreach { v =>
      repro.core.SeedExtract.extract(g, v, q.r, q.k, q.keywords).foreach { seed =>
        bySig(seed.vertices.mkString(",")) =
          repro.influence.MIA.sigma(g, seed.vertices, q.theta)
      }
    }
    bySig.values.toSeq.sortBy(-_).take(q.L)
  }

  /** Reference hop distances by Floyd–Warshall-free BFS per vertex. */
  def refDist(g: GraphData, source: Int): Map[Int, Int] = {
    val dist = mutable.HashMap[Int, Int](source -> 0)
    var frontier = List(source)
    var d = 0
    while (frontier.nonEmpty) {
      d += 1
      val next = mutable.ListBuffer[Int]()
      frontier.foreach { v =>
        g.foreachNeighbor(v) { (u, _) =>
          if (!dist.contains(u)) { dist(u) = d; next += u }
        }
      }
      frontier = next.toList
    }
    dist.toMap
  }
}
