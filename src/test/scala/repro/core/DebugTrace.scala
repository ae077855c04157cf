package repro.core

import repro.graph.CsrGraph

/** Replays one specific graph with tracing (RMCE_DEBUG_TRACE=1). */
object DebugTrace {
  def main(args: Array[String]): Unit = {
    val g = CsrGraph.fromEdges(8, Seq(
      (0, 1), (0, 3), (0, 4), (0, 6), (0, 7), (1, 2), (1, 3), (1, 5), (1, 6),
      (1, 7), (2, 4), (2, 5), (2, 6), (2, 7), (3, 4), (3, 5), (3, 6), (4, 5),
      (4, 7), (5, 7), (6, 7)))
    val cfg = RmceConfig(RecursionKind.Degen, false, true, false)
    val sink = new CollectingSink
    Rmce.run(g, cfg, sink)
    println(s"got ${sink.asSet.size}: ${sink.asSet.toSeq.sortBy(_.min).mkString(" ")}")
    println(s"exp: ${BruteForce.maximalCliques(g).toSeq.sortBy(_.min).mkString(" ")}")
  }
}
