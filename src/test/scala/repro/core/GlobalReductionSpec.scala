package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.{CsrGraph, Degeneracy}
import TestGraphs._

/** Invariant of Section 4: `mc(G) = mc(G′) + α(ΔV, ΔE)` — the reduction's
  * pre-reported cliques are exactly the maximal cliques of `G` missing from
  * the reduced graph's enumeration, with no duplicates and no non-maximal
  * reports.
  */
class GlobalReductionSpec extends AnyFunSuite {

  private def invariant(g: CsrGraph, label: String): Unit = {
    val sink = new CollectingSink
    val metrics = new Metrics(g.n)
    val res = GlobalReduction(g, sink, metrics)
    val pre = sink.cliques.map(_.toSet)
    assert(pre.size == pre.toSet.size, s"$label: duplicate pre-reported cliques")
    pre.foreach { c =>
      assert(BruteForce.isMaximalClique(g, c), s"$label: pre-report $c not maximal in G")
    }
    val rest = BruteForce.maximalCliques(res.reduced)
    assert(rest.intersect(pre.toSet).isEmpty, s"$label: clique found on both sides")
    assert(rest ++ pre == BruteForce.maximalCliques(g), s"$label: union mismatch")
    assert(metrics.preReportedGlobal == pre.size)
    assert(res.deletedEdges == g.m - res.reduced.m)
  }

  test("invariant on fixed graphs") {
    Seq("figure2" -> figure2, "paw" -> paw, "diamond" -> diamond, "k4" -> k4,
      "path5" -> path5, "cycle6" -> cycle6, "star5" -> star5,
      "singleEdge" -> singleEdge).foreach { case (l, g) => invariant(g, l) }
  }

  test("invariant on random graphs across densities") {
    for (seed <- 1 to 10) invariant(gnp(18, 0.12, seed), s"sparse-$seed")
    for (seed <- 1 to 10) invariant(gnp(15, 0.4, seed), s"med-$seed")
    for (seed <- 1 to 6) invariant(mixed(seed), s"mixed-$seed")
  }

  test("path is fully reduced") {
    val sink = new CollectingSink
    val res = GlobalReduction(path5, sink, new Metrics(path5.n))
    assert(res.reduced.m == 0)
    assert(sink.asSet == Set(Set(0, 1), Set(1, 2), Set(2, 3), Set(3, 4)))
  }

  test("star is fully reduced") {
    val sink = new CollectingSink
    val res = GlobalReduction(star5, sink, new Metrics(star5.n))
    assert(res.reduced.m == 0)
    assert(sink.cliques.size == 5)
  }

  test("2-D grid (road-network regime) is fully reduced") {
    val g = repro.gen.GraphGen.grid2d(12, 15).toCsr
    val sink = new CountingSink
    val res = GlobalReduction(g, sink, new Metrics(g.n))
    assert(res.reduced.m == 0, "triangle-free grid must lose every edge")
    assert(res.deletedVertices == g.n)
    assert(sink.count == g.m, "every grid edge is a maximal 2-clique")
  }

  test("triangular torus (Delaunay regime) is untouched") {
    val g = repro.gen.GraphGen.triangularTorus(6, 8).toCsr
    val sink = new CountingSink
    val res = GlobalReduction(g, sink, new Metrics(g.n))
    assert(res.reduced.m == g.m, "6-regular torus with all edges in triangles must survive")
    assert(res.deletedVertices == 0)
    assert(sink.count == 0)
  }

  test("complete graph is untouched") {
    val sink = new CountingSink
    val res = GlobalReduction(k6, sink, new Metrics(k6.n))
    assert(res.reduced.m == k6.m)
    assert(sink.count == 0)
  }

  test("isolated triangle collapses to one report") {
    val g = fromEdges(3, (0, 1), (1, 2), (0, 2))
    val sink = new CollectingSink
    val res = GlobalReduction(g, sink, new Metrics(3))
    assert(res.reduced.m == 0)
    assert(sink.asSet == Set(Set(0, 1, 2)))
  }

  test("degree-two case 3 keeps the base edge") {
    // v=4 has neighbours 0,1 which share another common neighbour 2.
    val g = fromEdges(5, (0, 1), (0, 2), (1, 2), (0, 3), (1, 3), (2, 3), (0, 4), (1, 4))
    val sink = new CollectingSink
    val res = GlobalReduction(g, sink, new Metrics(5))
    assert(sink.asSet == Set(Set(0, 1, 4)))
    assert(res.reduced.hasEdge(0, 1), "edge (0,1) still carried by clique {0,1,2,3}")
    assert(BruteForce.maximalCliques(res.reduced) == Set(Set(0, 1, 2, 3)))
  }

  test("reduction can cascade through multiple rounds") {
    // A triangle fan hanging off a pendant chain: removing the chain exposes
    // new low-degree vertices round after round.
    val g = fromEdges(7, (0, 1), (1, 2), (2, 3), (3, 4), (3, 5), (4, 5), (4, 6), (5, 6))
    invariant(g, "cascade")
  }

  test("degeneracy of the reduced graph never exceeds the original") {
    for (seed <- 1 to 6) {
      val g = mixed(seed)
      val res = GlobalReduction(g, new CountingSink, new Metrics(g.n))
      assert(Degeneracy.degeneracy(res.reduced) <= Degeneracy.degeneracy(g))
    }
  }
}
