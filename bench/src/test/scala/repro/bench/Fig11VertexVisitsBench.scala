package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Reports

/** Figure 11 (as a table) — per-degree vertex-visit counts for BKdegen,
  * BKrcd, and RMCEdegen on the paper's four study graphs (web-Google,
  * cit-Patents, soc-pokec, com-dblp), next to the number of maximal cliques
  * the vertices of that degree actually participate in. Paper shape: a wide
  * gap between visits and clique participation under the baselines,
  * substantially narrowed by RMCE (70–88% fewer visits at the reported
  * degrees).
  */
class Fig11VertexVisitsBench extends AnyFunSuite {

  test("Figure 11: vertex visits by degree") {
    val (text, rows) = Reports.fig11()
    println("\n=== Figure 11 (table): vertex visits by degree ===")
    println(text)

    assert(rows.nonEmpty)
    assert(rows.map(_.abbr).distinct.toSet == Set("wg", "cp", "sp", "cd"))
    // The baselines over-visit relative to clique participation.
    val overVisited = rows.count(r => r.visitsBk > r.cliques)
    assert(overVisited >= rows.size / 2, "baseline should visit far more than clique counts")
    // RMCE reduces visits at the visit-heavy degrees on every graph.
    rows.groupBy(_.abbr).foreach { case (abbr, rs) =>
      val totalBk = rs.map(_.visitsBk).sum
      val totalRmce = rs.map(_.visitsRmce).sum
      assert(totalRmce < totalBk,
        s"$abbr: RMCE visits $totalRmce not below baseline $totalBk")
      assert(rs.exists(_.reductionVsBk > 0.3),
        s"$abbr: expected a ≥30% visit reduction at some degree")
    }
  }
}
