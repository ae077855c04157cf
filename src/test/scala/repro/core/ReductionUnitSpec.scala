package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graph.CsrGraph
import TestGraphs._

/** Direct unit tests of DynamicReduction and ForbiddenSetReduction (their
  * end-to-end behaviour is covered by RmceCorrectnessSpec).
  */
class ReductionUnitSpec extends AnyFunSuite {

  test("dynamic degree-zero: unmarked vertex reported, marked vertex dropped silently") {
    // Subproblem rooted at 0 in a paw + pendant: P holds an isolated-in-P
    // vertex with and without an X witness.
    // Graph: 0-1, 0-2, 0-3, 1-2 (so under root {0}: P ⊇ {1,2,3}).
    val g = CsrGraph.fromEdges(4, Seq((0, 1), (0, 2), (0, 3), (1, 2)))
    val dyn = new DynamicReduction(g.n)
    val r = new IntStack(); r.push(0)
    val reports = scala.collection.mutable.ArrayBuffer.empty[Set[Int]]
    val report: (Array[Int], Int) => Unit = (a, l) => reports += a.take(l).toSet
    val m = new Metrics(g.n)
    // P = {1,2,3}, X = {} — 3 is dynamic degree-0 and unmarked; {1,2} is a
    // mutual degree-one pair, so the rule also reports {0,1,2}.
    val out = dyn.apply(g, r, Array(1, 2, 3), Array.empty, report, m)
    assert(reports.contains(Set(0, 3)))
    assert(reports.contains(Set(0, 1, 2)))
    assert(!out.p.contains(3))
    assert(m.preReportedDynamic == 2)
  }

  test("dynamic degree-zero: marked vertex is removed without a report") {
    // X = {1}, P = {2} with 2 adjacent to 1 ⇒ marked, dropped silently.
    val g = CsrGraph.fromEdges(3, Seq((0, 1), (0, 2), (1, 2)))
    val dyn = new DynamicReduction(g.n)
    val r = new IntStack(); r.push(0)
    val reports = scala.collection.mutable.ArrayBuffer.empty[Set[Int]]
    val out = dyn.apply(g, r, Array(2), Array(1), (a, l) => reports += a.take(l).toSet, new Metrics(3))
    assert(reports.isEmpty)
    assert(out.p.isEmpty)
    assert(out.removedAny)
  }

  test("dynamic degree-(|P|-1) hoists the full-degree vertices and intersects X") {
    // Root 0 of figure2-like core: P = {1,2,3,4} forming K4 ⇒ all hoisted.
    val g = k6
    val dyn = new DynamicReduction(g.n)
    val r = new IntStack(); r.push(0)
    val out = dyn.apply(g, r, Array(1, 2, 3, 4, 5), Array.empty,
      (_, _) => fail("no report expected"), new Metrics(g.n))
    assert(out.hoisted == 5)
    assert(out.p.isEmpty)
    assert(r.size == 6)
  }

  test("dynamic degree-one pair: reported once, both removed when mutual") {
    // P = {1,2} adjacent only to each other, X empty.
    val g = CsrGraph.fromEdges(3, Seq((0, 1), (0, 2), (1, 2)))
    val dyn = new DynamicReduction(g.n)
    val r = new IntStack(); r.push(0)
    val reports = scala.collection.mutable.ArrayBuffer.empty[Set[Int]]
    val out = dyn.apply(g, r, Array(1, 2), Array.empty, (a, l) => reports += a.take(l).toSet, new Metrics(3))
    // {0,1,2} reported by the degree-one rule, pair removed, nothing hoisted.
    assert(reports.toSeq == Seq(Set(0, 1, 2)))
    assert(out.p.isEmpty && out.hoisted == 0)
  }

  test("forbidden set reduction never prunes on K6 (mutual dominance cycles)") {
    val d = repro.graph.Degeneracy.decompose(k6)
    val g = k6.relabelled(d.order)
    val fsr = new ForbiddenSetReduction(g.n)
    for (i <- 0 until g.n) {
      val p = g.laterNeighbors(i)
      val x = g.earlierNeighbors(i)
      val x1 = fsr.reduceAndUpdate(g, i, p, x)
      assert(x1.nonEmpty || x.isEmpty,
        s"root $i: forbidden set emptied by circular dominance — unsound")
    }
  }

  test("forbidden set reduction prunes a genuinely dominated vertex") {
    // Path-like order: 0-2, 1-2, 1-3, 2-3: under labels as order,
    // N+(0)={2} ⊆ N+(1)={2,3}; at root 2, X={0,1} and 0 is dominated by 1.
    val g = CsrGraph.fromEdges(4, Seq((0, 2), (1, 2), (1, 3), (2, 3)))
    val fsr = new ForbiddenSetReduction(g.n)
    // Simulate the iteration order 0,1,2,3 (labels are already the order).
    fsr.reduceAndUpdate(g, 0, g.laterNeighbors(0), g.earlierNeighbors(0))
    fsr.reduceAndUpdate(g, 1, g.laterNeighbors(1), g.earlierNeighbors(1))
    // Root 1 learns P\{2}={3} ⊆ N⁺(2), so vertex 1 is dominated by 2 at
    // every root after 2 — at root 3, X={1,2} loses 1 (its dominator 2 is
    // kept) but keeps 2.
    val x2 = fsr.reduceAndUpdate(g, 2, g.laterNeighbors(2), g.earlierNeighbors(2))
    assert(x2.toSeq == Seq(0, 1), s"no prune valid yet at root 2, got ${x2.toSeq}")
    val x3 = fsr.reduceAndUpdate(g, 3, g.laterNeighbors(3), g.earlierNeighbors(3))
    assert(x3.toSeq == Seq(2), s"expected {2} after pruning dominated 1, got ${x3.toSeq}")
  }

  test("IntStack push/pop/copy") {
    val s = new IntStack(2)
    (1 to 10).foreach(s.push)
    assert(s.size == 10)
    assert(s(0) == 1 && s(9) == 10)
    assert(s.pop() == 10)
    val buf = new Array[Int](16)
    assert(s.copyInto(buf) == 9)
    assert(buf.take(9).toSeq == (1 to 9))
    s.clear()
    assert(s.isEmpty)
    assertThrows[IllegalArgumentException](s.pop())
  }

  test("Bits helpers") {
    val arr = new Array[Long](4) // two 2-word masks
    Bits.setBit(arr, 0, 3); Bits.setBit(arr, 0, 70)
    Bits.setBit(arr, 2, 3)
    assert(Bits.testBit(arr, 0, 3) && Bits.testBit(arr, 0, 70) && !Bits.testBit(arr, 0, 4))
    assert(Bits.popcount(arr, 0, 2) == 2)
    assert(Bits.andPopcount(arr, 0, arr, 2, 2) == 1)
    assert(Bits.singleBitOfAnd(arr, 0, arr, 2, 2) == 3)
    val collected = scala.collection.mutable.ArrayBuffer.empty[Int]
    Bits.forEachBit(arr, 0, 2)(collected += _)
    assert(collected.toSeq == Seq(3, 70))
    Bits.clearBit(arr, 0, 3)
    assert(!Bits.testBit(arr, 0, 3))
    assert(!Bits.isEmpty(arr, 0, 2))
    val out = Bits.and(arr, 0, arr, 2, 2)
    assert(out.forall(_ == 0L))
  }

  test("CliqueSink.cliqueHash is order-independent and size-sensitive") {
    val a = CliqueSink.cliqueHash(Array(1, 2, 3), 3)
    val b = CliqueSink.cliqueHash(Array(3, 1, 2), 3)
    val c = CliqueSink.cliqueHash(Array(1, 2, 4), 3)
    val d = CliqueSink.cliqueHash(Array(1, 2), 2)
    assert(a == b)
    assert(a != c)
    assert(a != d)
  }

  test("CountingSink merge combines counts, checksums, and histograms") {
    val s1 = new CountingSink
    val s2 = new CountingSink
    s1.report(Array(1, 2), 2)
    s2.report(Array(3, 4, 5), 3)
    s1.merge(s2)
    assert(s1.count == 2 && s1.maxSize == 3)
    assert(s1.sizeHist(2L) == 1 && s1.sizeHist(3L) == 1)
  }

  test("Metrics merge sums counters and visit arrays") {
    val m1 = new Metrics(3); val m2 = new Metrics(3)
    m1.recursiveCalls = 5; m2.recursiveCalls = 7
    m1.visit(0); m2.visit(0); m2.visit(2)
    m1.merge(m2)
    assert(m1.recursiveCalls == 12)
    assert(m1.vertexVisits.toSeq == Seq(2L, 0L, 1L))
    assertThrows[IllegalArgumentException](m1.merge(new Metrics(4)))
  }

  test("Metrics.visitsByDegree buckets by supplied degrees") {
    val m = new Metrics(4)
    m.visit(0); m.visit(1); m.visit(1); m.visit(3)
    val byDeg = m.visitsByDegree(Array(2, 2, 5, 7))
    assert(byDeg == Map(2 -> 3L, 7 -> 1L))
  }
}
