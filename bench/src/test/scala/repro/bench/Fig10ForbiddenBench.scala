package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Reports

/** Figure 10 (as a table) — maximality check reduction yield: r_vertex is
  * the fraction of forbidden-set entries pruned when constructing root
  * subproblems; r_subproblem is the fraction of root subproblems whose X
  * strictly shrank. Paper shape: r_vertex approaches 50% on the
  * collaboration/web graphs (ca, cd, wg, ws) and r_subproblem reaches ~40%
  * on clique-rich graphs.
  */
class Fig10ForbiddenBench extends AnyFunSuite {

  test("Figure 10: forbidden-set reduction ratios") {
    val (text, rows) = Reports.fig10()
    println("\n=== Figure 10 (table): maximality check reduction ===")
    println(text)

    assert(rows.size == 18)
    rows.foreach { r =>
      assert(r.rVertex >= 0.0 && r.rVertex <= 1.0)
      assert(r.rSubproblem >= 0.0 && r.rSubproblem <= 1.0)
      assert(r.xKept <= r.xTotal)
    }
    // Reduction fires somewhere meaningful across the suite.
    assert(rows.count(_.rVertex > 0.05) >= 6,
      "forbidden-set pruning should be visible on a third of the suite")
    // Clique-rich collaboration stand-ins show the strongest pruning
    // (paper: ca/cd/wg/ws near 50%).
    val strong = rows.filter(r => Seq("ca", "cd", "wg", "ws").contains(r.abbr))
    assert(strong.exists(_.rVertex > 0.10),
      s"collaboration graphs should prune X: ${strong.map(r => r.abbr -> r.rVertex)}")
  }
}
