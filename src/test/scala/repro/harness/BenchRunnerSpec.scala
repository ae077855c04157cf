package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{RecursionKind, RmceConfig, TestGraphs}

class BenchRunnerSpec extends AnyFunSuite {

  test("timeLocal returns consistent stats") {
    val g = TestGraphs.mixed(3)
    val s = BenchRunner.timeLocal("mixed3", g, RmceConfig.rmce(RecursionKind.Degen), 1, 3)
    assert(s.dataset == "mixed3")
    assert(s.algo == "RMCEdegen")
    assert(s.timeMs > 0)
    assert(s.cliques > 0)
    assert(s.recursiveCalls >= 0)
    assert(s.forbiddenXKept <= s.forbiddenXTotal)
  }

  test("timeLocal is deterministic in results across repetitions") {
    val g = TestGraphs.mixed(5)
    val a = BenchRunner.timeLocal("m", g, RmceConfig.baseline(RecursionKind.Rcd), 0, 1)
    val b = BenchRunner.timeLocal("m", g, RmceConfig.baseline(RecursionKind.Rcd), 0, 3)
    assert(a.cliques == b.cliques && a.checksum == b.checksum)
    assert(a.recursiveCalls == b.recursiveCalls)
  }

  test("config labels distinguish baselines, RMCE, and variants") {
    assert(RmceConfig.baseline(RecursionKind.Degen).label == "BKdegen")
    assert(RmceConfig.rmce(RecursionKind.Facen).label == "RMCEfacen")
    assert(RmceConfig.variant1(RecursionKind.Degen).label == "RMCEdegen-g")
    assert(RmceConfig.variant2(RecursionKind.Rcd).label == "RMCErcd-d")
    assert(RmceConfig.variant3(RecursionKind.Revised).label == "RMCErevised-m")
  }

  test("formatTable aligns columns and includes a separator") {
    val t = BenchRunner.formatTable(Seq("a", "bbbb"), Seq(Seq("xx", "y"), Seq("z", "wwwww")))
    val lines = t.split("\n")
    assert(lines.length == 4)
    assert(lines.map(_.length).distinct.size == 1, "all lines equal width")
    assert(lines(1).forall(c => c == '-' || c == ' '))
  }

  test("number formatting helpers") {
    assert(BenchRunner.f1(1.25) == "1.2" || BenchRunner.f1(1.25) == "1.3")
    assert(BenchRunner.f2(3.14159) == "3.14")
    assert(BenchRunner.pct(0.5) == "50.0%")
  }

  test("dataset loads a CSR by abbreviation") {
    val g = BenchRunner.dataset("rc")
    assert(g.n > 0 && g.m > 0)
  }
}
