package repro.core

import org.scalatest.funsuite.AnyFunSuite
import TestGraphs._

/** One named test per algorithm configuration (4 recursions × 8 reduction
  * subsets) on a mixed-regime graph, and one per recursion on every fixed
  * fixture — so a regression pinpoints the exact configuration it broke.
  */
class RmcePerConfigSpec extends AnyFunSuite {

  private val mixedGraph = mixed(1)
  private lazy val mixedExpected = BruteForce.maximalCliques(mixedGraph)

  allConfigs.foreach { cfg =>
    test(s"config ${cfg.label} (g=${cfg.globalReduction}, d=${cfg.dynamicReduction}, " +
      s"m=${cfg.maximalityReduction}) matches brute force on a mixed graph") {
      val sink = new CollectingSink
      Rmce.run(mixedGraph, cfg, sink)
      assert(sink.cliques.size == sink.asSet.size, "duplicates reported")
      assert(sink.asSet == mixedExpected)
    }
  }

  private val fixtures = Seq(
    "figure2" -> figure2, "paw" -> paw, "diamond" -> diamond, "k4" -> k4,
    "k6" -> k6, "path5" -> path5, "cycle6" -> cycle6, "star5" -> star5,
    "singleEdge" -> singleEdge)

  for ((name, g) <- fixtures; k <- RecursionKind.all) {
    test(s"RMCE${k.name} on $name") {
      assert(enumerate(g, RmceConfig.rmce(k)) == BruteForce.maximalCliques(g))
    }
  }

  for (k <- RecursionKind.all) {
    test(s"BK${k.name} handles an empty graph") {
      val g = repro.graph.CsrGraph.fromEdges(3, Seq.empty)
      assert(enumerate(g, RmceConfig.baseline(k)).isEmpty)
      assert(enumerate(g, RmceConfig.rmce(k)).isEmpty)
    }

    test(s"RMCE${k.name} reports each clique exactly once on overlapping cliques") {
      // Two K4s sharing a triangle: exactly two maximal cliques.
      val g = fromEdges(5,
        (0, 1), (0, 2), (1, 2), (0, 3), (1, 3), (2, 3), (0, 4), (1, 4), (2, 4))
      val sink = new CollectingSink
      Rmce.run(g, RmceConfig.rmce(k), sink)
      assert(sink.cliques.size == 2)
      assert(sink.asSet == Set(Set(0, 1, 2, 3), Set(0, 1, 2, 4)))
    }
  }
}
