package repro.core

import repro.graph.CsrGraph
import scala.util.Random

/** Shared fixtures for kernel tests: small named graphs plus deterministic
  * random graphs in several structural regimes.
  */
object TestGraphs {

  def fromEdges(n: Int, edges: (Int, Int)*): CsrGraph = CsrGraph.fromEdges(n, edges)

  /** The toy graph of the paper's Figure 2 (u1..u10 → 0..9): a dense core
    * {u1..u5}, u8 attached to the core, non-triangle edges (u2,u6), (u3,u7),
    * u6/u7 also attached to u8, and a pendant u10 on u4.
    */
  val figure2: CsrGraph = fromEdges(10,
    (0, 1), (0, 2), (0, 3), (0, 4), (1, 2), (1, 3), (1, 4), (2, 3), (2, 4),
    (3, 9),            // u4-u10 pendant
    (1, 5), (2, 6),    // u2-u6, u3-u7 non-triangle edges
    (0, 7), (1, 7), (2, 7), (5, 7), (6, 7)) // u8 adjacent to u1,u2,u3,u6,u7

  /** Triangle with a pendant. */
  val paw: CsrGraph = fromEdges(4, (0, 1), (0, 2), (1, 2), (2, 3))

  /** Two triangles sharing an edge (diamond / K4 minus an edge). */
  val diamond: CsrGraph = fromEdges(4, (0, 1), (0, 2), (1, 2), (1, 3), (2, 3))

  val k4: CsrGraph = fromEdges(4, (0, 1), (0, 2), (0, 3), (1, 2), (1, 3), (2, 3))
  val k6: CsrGraph = fromEdges(6, (for (i <- 0 until 6; j <- (i + 1) until 6) yield (i, j)): _*)

  val path5: CsrGraph = fromEdges(5, (0, 1), (1, 2), (2, 3), (3, 4))
  val cycle6: CsrGraph = fromEdges(6, (0, 1), (1, 2), (2, 3), (3, 4), (4, 5), (5, 0))
  val star5: CsrGraph = fromEdges(6, (0, 1), (0, 2), (0, 3), (0, 4), (0, 5))
  val singleEdge: CsrGraph = fromEdges(2, (0, 1))

  /** G(n, p) with at least one edge (deterministic in (n, p, seed)). */
  def gnp(n: Int, p: Double, seed: Long): CsrGraph = {
    val rnd = new Random(seed)
    val edges = for {
      i <- 0 until n
      j <- (i + 1) until n
      if rnd.nextDouble() < p
    } yield (i, j)
    if (edges.isEmpty) fromEdges(n, (0, 1)) else fromEdges(n, edges: _*)
  }

  /** A mixed-regime random graph: a dense core, a sparse periphery, pendant
    * and degree-2 fringe — exercises every reduction rule at once.
    */
  def mixed(seed: Long): CsrGraph = {
    val rnd = new Random(seed)
    val nCore = 8 + rnd.nextInt(6)
    val nPeri = 10 + rnd.nextInt(10)
    val n = nCore + nPeri + 8
    val edges = scala.collection.mutable.ArrayBuffer.empty[(Int, Int)]
    for (i <- 0 until nCore; j <- (i + 1) until nCore)
      if (rnd.nextDouble() < 0.6) edges += ((i, j))
    for (v <- nCore until (nCore + nPeri)) {
      val deg = 1 + rnd.nextInt(3)
      for (_ <- 0 until deg) edges += ((v, rnd.nextInt(v)))
    }
    // fringe: pendants and degree-2 bridges
    for (v <- (nCore + nPeri) until n) {
      edges += ((v, rnd.nextInt(nCore + nPeri)))
      if (rnd.nextBoolean()) edges += ((v, rnd.nextInt(nCore + nPeri)))
    }
    CsrGraph.fromEdges(n, edges)
  }

  /** All RMCE/BK configurations: 4 recursions × 8 reduction subsets. */
  val allConfigs: Seq[RmceConfig] = for {
    k <- RecursionKind.all
    g <- Seq(false, true)
    d <- Seq(false, true)
    m <- Seq(false, true)
  } yield RmceConfig(k, g, d, m)

  /** Run one config, returning the full clique set. */
  def enumerate(g: CsrGraph, cfg: RmceConfig): Set[Set[Int]] = {
    val sink = new CollectingSink
    Rmce.run(g, cfg, sink)
    sink.asSet
  }
}
