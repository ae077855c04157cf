package repro.graph

import org.scalatest.funsuite.AnyFunSuite

class CsrGraphSpec extends AnyFunSuite {

  private val g = CsrGraph.fromEdges(5, Seq((0, 1), (1, 2), (2, 3), (0, 3), (1, 3)))

  test("degrees and m") {
    assert(g.n == 5)
    assert(g.m == 5)
    assert((0 until 5).map(g.degree) == Seq(2, 3, 2, 3, 0))
  }

  test("neighbors sorted and symmetric") {
    assert(g.neighbors(1).toSeq == Seq(0, 2, 3))
    assert(g.neighbors(3).toSeq == Seq(0, 1, 2))
    assert(g.neighbors(4).toSeq == Seq.empty)
    for (v <- 0 until g.n; u <- g.neighbors(v)) assert(g.neighbors(u).contains(v))
  }

  test("self-loops dropped, duplicates collapsed") {
    val h = CsrGraph.fromEdges(3, Seq((0, 0), (0, 1), (1, 0), (0, 1), (1, 2)))
    assert(h.m == 2)
    assert(h.neighbors(0).toSeq == Seq(1))
  }

  test("split separates earlier and later neighbours") {
    assert(g.earlierNeighbors(1).toSeq == Seq(0))
    assert(g.laterNeighbors(1).toSeq == Seq(2, 3))
    assert(g.laterNeighbors(3).toSeq == Seq.empty)
    assert(g.earlierNeighbors(0).toSeq == Seq.empty)
    assert(g.laterDegree(0) == 2)
  }

  test("hasEdge") {
    assert(g.hasEdge(0, 1) && g.hasEdge(1, 0))
    assert(!g.hasEdge(0, 2))
    assert(!g.hasEdge(4, 0))
  }

  test("edges are canonical (u < v) and complete") {
    assert(g.edges.toSet == Set((0, 1), (1, 2), (2, 3), (0, 3), (1, 3)))
  }

  test("maxDegree") { assert(g.maxDegree == 3) }

  test("relabelled permutes ids consistently") {
    val order = Array(4, 3, 2, 1, 0) // old id order(i) becomes new id i
    val h = g.relabelled(order)
    // old edge (0,1) -> new (4,3)
    assert(h.edges.toSet == Set((3, 4), (2, 3), (1, 2), (1, 4), (1, 3)))
    assert((0 until 5).map(h.degree) == Seq(0, 3, 2, 3, 2))
  }

  test("fromLongEdges compacts ids and returns the mapping") {
    val (h, toOrig) = CsrGraph.fromLongEdges(Seq((100L, 7L), (7L, 55L), (100L, 55L)))
    assert(h.n == 3)
    assert(toOrig.toSeq == Seq(7L, 55L, 100L))
    assert(h.m == 3)
    assert(h.hasEdge(0, 1) && h.hasEdge(1, 2) && h.hasEdge(0, 2))
  }

  test("fromLongEdges drops self-loops before compacting") {
    val (h, toOrig) = CsrGraph.fromLongEdges(Seq((5L, 5L), (1L, 2L)))
    assert(h.n == 2)
    assert(toOrig.toSeq == Seq(1L, 2L))
  }

  test("rejects out-of-range vertices") {
    assertThrows[IllegalArgumentException](CsrGraph.fromEdges(2, Seq((0, 2))))
  }
}
