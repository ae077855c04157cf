package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Reports

/** Table 3 — ablation study: full RMCEdegen vs Variant1 (no global
  * reduction), Variant2 (no dynamic reduction), Variant3 (no maximality
  * check reduction). Absolute times differ from the paper's C++/full-size
  * graphs; the shape under reproduction is:
  *
  *  - every variant enumerates the identical clique set (checked inside
  *    Reports.table3);
  *  - disabling dynamic reduction (Variant2) hurts most broadly — in the
  *    paper Variant2 is the slowest variant on the large majority of
  *    datasets;
  *  - disabling global reduction (Variant1) *helps* on a handful of graphs
  *    (7/18 in the paper) — the reduction has a real cost;
  *  - on the road graphs global reduction is decisive (paper: 11.51 vs
  *    19.07 s on inf-road-usa).
  */
class Table3AblationBench extends AnyFunSuite {

  test("Table 3: ablation of the three reductions") {
    val (text, rows) = Reports.table3(reps = 5)
    println("\n=== Table 3: Ablation (measured ms; paper values in seconds) ===")
    println(text)

    assert(rows.size == 18)
    // Variant2 (no dynamic reduction) is the worst variant on most graphs.
    val v2Worst = rows.count(r => r.tV2 >= Seq(r.tV1, r.tV3).max * 0.95)
    assert(v2Worst >= 10, s"dynamic reduction should dominate the ablation; v2-worst on $v2Worst/18")
    // Global reduction is decisive on the fully-reducible road graphs.
    Seq("in", "rc").foreach { a =>
      val r = rows.find(_.abbr == a).get
      assert(r.tV1 > r.tFull, s"$a: removing global reduction must hurt (${r.tV1} vs ${r.tFull})")
    }
    // The full version should win or tie (within noise) on a majority-ish
    // of datasets, as in the paper (11/18 there).
    val fullWins = rows.count(r => r.tFull <= Seq(r.tV1, r.tV2, r.tV3).min * 1.15)
    assert(fullWins >= 7, s"full RMCE competitive on only $fullWins/18 datasets")
  }
}
