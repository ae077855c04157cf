package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.gen.Datasets
import repro.graph.CsrGraph

/** Differential testing at dataset scale: brute force is infeasible on the
  * stand-ins, but all 4 recursions × all reduction settings must agree on
  * the clique count and the order-independent multiset checksum — any
  * kernel or reduction bug that survives the small-graph suites would have
  * to produce a hash-colliding wrong answer to pass here.
  */
class AlgoAgreementSpec extends AnyFunSuite {

  private val smallAbbrs = Seq("sd", "rc", "ee", "cy", "lg", "ca")

  private def run(g: CsrGraph, cfg: RmceConfig): (Long, Long) = {
    val sink = new CountingSink
    Rmce.run(g, cfg, sink)
    (sink.count, sink.checksum)
  }

  smallAbbrs.foreach { abbr =>
    RecursionKind.all.foreach { k =>
      test(s"$abbr/${k.name}: baseline, full RMCE, and all ablation variants agree") {
        val g = Datasets.byAbbr(abbr).csr
        val results = Seq(
          RmceConfig.baseline(k),
          RmceConfig.rmce(k),
          RmceConfig.variant1(k),
          RmceConfig.variant2(k),
          RmceConfig.variant3(k)).map(cfg => cfg.label -> run(g, cfg))
        val distinct = results.map(_._2).distinct
        assert(distinct.size == 1, s"divergent results: $results")
      }
    }
  }

  test("the four recursions agree with each other on every small stand-in") {
    smallAbbrs.foreach { abbr =>
      val g = Datasets.byAbbr(abbr).csr
      val perRec = RecursionKind.all.map(k => k.name -> run(g, RmceConfig.rmce(k)))
      assert(perRec.map(_._2).distinct.size == 1, s"$abbr: $perRec")
    }
  }

  test("clique counts are plausible: at least one clique per surviving edge-dense region") {
    val g = Datasets.byAbbr("sd").csr
    val (count, _) = run(g, RmceConfig.rmce(RecursionKind.Degen))
    // 6-regular toroidal lattice: exactly 2 triangles per vertex.
    assert(count == 2L * g.n, s"torus must have 2n maximal triangles, got $count")
  }

  test("grid stand-ins: every edge is its own maximal clique") {
    Seq("in", "rc").foreach { abbr =>
      val g = Datasets.byAbbr(abbr).csr
      val (count, _) = run(g, RmceConfig.rmce(RecursionKind.Degen))
      assert(count == g.m, s"$abbr: expected ${g.m} 2-cliques, got $count")
    }
  }
}
