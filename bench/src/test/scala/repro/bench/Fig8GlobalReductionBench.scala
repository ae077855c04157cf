package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Reports

/** Figure 8 (as a table) — global-reduction yield per graph. Paper shape:
  * road graphs lose 100% of vertices and edges, sc-delaunay loses nothing,
  * over a third of vertices go in the fringe-heavy web/communication
  * graphs, and over 20% of edges go in several of them.
  */
class Fig8GlobalReductionBench extends AnyFunSuite {

  test("Figure 8: reduction ratio of global reduction") {
    val (text, rows) = Reports.fig8()
    println("\n=== Figure 8 (table): global reduction yield ===")
    println(text)

    val byAbbr = rows.map(r => r.abbr -> r).toMap
    // Paper: inf-road-usa and roadNet-CA fully deleted.
    Seq("in", "rc").foreach { a =>
      assert(byAbbr(a).vRatio == 1.0 && byAbbr(a).eRatio == 1.0, s"$a must fully reduce")
    }
    // Paper: sc-delaunay_n23 loses no vertices or edges.
    assert(byAbbr("sd").vRatio == 0.0 && byAbbr("sd").eRatio == 0.0, "sd must be untouched")
    // Paper: over 35% of vertices deleted in 12 graphs — our fringe-heavy
    // stand-ins must clear that bar on a comparable group.
    val heavy = rows.count(_.vRatio > 0.35)
    assert(heavy >= 8, s"expected ≥8 graphs with >35% vertex reduction, got $heavy")
    // Paper: over 20% of edges deleted in 9 graphs.
    val edgeHeavy = rows.count(_.eRatio > 0.20)
    assert(edgeHeavy >= 5, s"expected ≥5 graphs with >20% edge reduction, got $edgeHeavy")
    // Dense graphs barely reduce.
    Seq("co", "fl").foreach(a => assert(byAbbr(a).vRatio < 0.05, s"$a should not reduce"))
  }
}
