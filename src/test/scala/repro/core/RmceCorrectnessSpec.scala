package repro.core

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => ScTest}
import repro.graph.CsrGraph
import TestGraphs._

/** Every algorithm configuration must report exactly the brute-force set of
  * maximal cliques — on fixed graphs, on random G(n,p) across densities, and
  * on mixed-regime graphs that trigger every reduction rule. Duplicates are
  * caught because the collected sequence length must equal the set size.
  */
class RmceCorrectnessSpec extends AnyFunSuite {

  /** Run a scalacheck property inside a funsuite test (plain scalacheck —
    * the scalatestplus bridge is not available offline).
    */
  private def checkProp(prop: Prop, minSuccessful: Int): Unit = {
    val params = ScTest.Parameters.default.withMinSuccessfulTests(minSuccessful)
    val res = ScTest.check(params, prop)
    assert(res.passed, s"property failed: ${res.status}")
  }

  private def check(g: CsrGraph, label: String): Unit = {
    val expected = BruteForce.maximalCliques(g)
    allConfigs.foreach { cfg =>
      val sink = new CollectingSink
      Rmce.run(g, cfg, sink)
      assert(sink.cliques.size == sink.asSet.size,
        s"$label/${cfg.label}: duplicate cliques reported")
      assert(sink.asSet == expected,
        s"$label/${cfg.label}: wrong clique set" +
          s"\n  missing: ${(expected -- sink.asSet).take(5)}" +
          s"\n  extra:   ${(sink.asSet -- expected).take(5)}")
    }
  }

  private val fixed = Seq(
    "figure2" -> figure2, "paw" -> paw, "diamond" -> diamond, "k4" -> k4,
    "k6" -> k6, "path5" -> path5, "cycle6" -> cycle6, "star5" -> star5,
    "singleEdge" -> singleEdge)

  fixed.foreach { case (name, g) =>
    test(s"all 32 configs match brute force on $name") { check(g, name) }
  }

  test("figure2 has the cliques worked out in the paper's Example 2") {
    val mc = BruteForce.maximalCliques(figure2)
    assert(mc.contains(Set(0, 1, 2, 3))) // {u1,u2,u3,u4}
    assert(mc.contains(Set(0, 1, 2, 4))) // {u1,u2,u3,u5}
    assert(mc.contains(Set(3, 9)))       // {u4,u10} — the pendant 2-clique
  }

  test("all configs match brute force on sparse G(n,p)") {
    for (seed <- 1 to 8) check(gnp(18, 0.12, seed), s"gnp18-sparse-$seed")
  }

  test("all configs match brute force on medium G(n,p)") {
    for (seed <- 1 to 8) check(gnp(16, 0.35, seed), s"gnp16-med-$seed")
  }

  test("all configs match brute force on dense G(n,p)") {
    for (seed <- 1 to 6) check(gnp(13, 0.65, seed), s"gnp13-dense-$seed")
  }

  test("all configs match brute force on near-complete graphs") {
    for (seed <- 1 to 4) check(gnp(10, 0.9, seed), s"gnp10-nearK-$seed")
  }

  test("all configs match brute force on mixed-regime graphs") {
    for (seed <- 1 to 10) check(mixed(seed), s"mixed-$seed")
  }

  test("property: random graphs across the density range") {
    val genGraph = for {
      n <- Gen.choose(4, 15)
      p <- Gen.choose(0.05, 0.8)
      seed <- Gen.choose(0L, 1000000L)
    } yield (n, p, seed)
    checkProp(Prop.forAll(genGraph) { case (n, p, seed) =>
      check(gnp(n, p, seed), s"prop-$n-$p-$seed")
      true
    }, minSuccessful = 60)
  }

  test("counting sink checksum distinguishes different clique sets") {
    val a = enumerate(k4, RmceConfig.baseline(RecursionKind.Degen))
    val s1 = new CountingSink
    val s2 = new CountingSink
    Rmce.run(k4, RmceConfig.rmce(RecursionKind.Degen), s1)
    Rmce.run(diamond, RmceConfig.rmce(RecursionKind.Degen), s2)
    assert(a == Set(Set(0, 1, 2, 3)))
    assert(s1.checksum != s2.checksum)
  }

  test("counting sink checksum is identical across all configs (big graph)") {
    val g = gnp(40, 0.25, 42)
    val sums = allConfigs.map { cfg =>
      val s = new CountingSink
      Rmce.run(g, cfg, s)
      (cfg.label, s.count, s.checksum)
    }
    val counts = sums.map(_._2).distinct
    val checks = sums.map(_._3).distinct
    assert(counts.size == 1, s"clique counts diverge: $sums")
    assert(checks.size == 1, s"checksums diverge: $sums")
  }
}
