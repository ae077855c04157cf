package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Reports

/** Figure 9 (as a table) — ratio of recursive calls, RMCEx / BKx. Paper
  * shape: RMCEdegen ≤ 17.6%, RMCErcd ≤ 28.5%, RMCEfacen ≤ 4.5%,
  * RMCErevised ≤ 20.5% on every graph, and 0% on the fully-reduced road
  * graphs. Our stand-ins are smaller and shallower, so the asserted bounds
  * are looser, but the ordering facts hold: ratios ≤ 100% everywhere, 0%
  * on roads, and a strong reduction on the fringe-heavy graphs.
  */
class Fig9RecursiveCallsBench extends AnyFunSuite {

  test("Figure 9: ratio of recursive calls") {
    val (text, rows) = Reports.fig9()
    println("\n=== Figure 9 (table): ratio of recursive calls RMCE/BK ===")
    println(text)

    assert(rows.size == 18 * 4)
    rows.foreach(r => assert(r.ratio <= 1.0, s"${r.abbr}/${r.recursion}: ratio ${r.ratio} > 1"))
    // Roads: all vertices removed globally, zero recursive calls remain.
    rows.filter(r => Seq("in", "rc").contains(r.abbr)).foreach { r =>
      assert(r.rmceCalls == 0, s"${r.abbr}/${r.recursion}: expected 0 calls, got ${r.rmceCalls}")
    }
    // The suite-wide median ratio should show strong pruning (paper: ≤ ~30%).
    val byRec = rows.groupBy(_.recursion)
    byRec.foreach { case (rec, rs) =>
      val med = rs.map(_.ratio).sorted.apply(rs.size / 2)
      assert(med <= 0.6, s"$rec: median call ratio $med too weak")
    }
  }
}
