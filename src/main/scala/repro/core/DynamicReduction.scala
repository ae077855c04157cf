package repro.core

import repro.graph.{CsrGraph, IntSets}

/** Outcome of one dynamic-reduction application.
  *
  * Beyond the reduced sets, it carries the bookkeeping needed to keep the
  * BK maximality invariant honest: a vertex removed by the degree-0/1 rules
  * is adjacent to all of `R` but lands in neither `P` nor `X`, so it can
  * still extend exactly two shapes of clique — bare `R`, and (for a removed
  * degree-1 vertex) `R ∪ {its surviving partner}`. `removedAny` and
  * `partners` let the recursion suppress precisely those reports (and flag
  * the partner's branch) instead of emitting non-maximal cliques. See the
  * scaladoc of [[DynamicReduction]] for the full argument.
  */
final class DynOutcome(
    val p: Array[Int],
    val x: Array[Int],
    val hoisted: Int,
    val removedAny: Boolean,
    val partners: Array[Int]) {

  def partnerContains(v: Int): Boolean = {
    var i = 0
    while (i < partners.length) { if (partners(i) == v) return true; i += 1 }
    false
  }
}

/** Dynamic vertex reduction (Section 5, Alg. 7) for one subproblem
  * `(R, P, X)`:
  *
  *  1. dynamic degree-0 vertices (Lemma 5) — reported (if unmarked) and
  *     dropped from `P`;
  *  2. dynamic degree-1 vertices under the *relaxed* rule (Lemma 7) — the
  *     pair is reported and the vertex dropped when either endpoint has no
  *     neighbour in `X`;
  *  3. dynamic degree-(|P|−1) vertices (Lemma 8) — hoisted straight into
  *     `R`, with `X` re-intersected against their neighbourhoods (Alg. 7
  *     line 15).
  *
  * A vertex `u ∈ P` is "marked" iff `N(u) ∩ X ≠ ∅`; marks are computed
  * *lazily* (only for the few degree-0/1 vertices and their partners) and
  * memoised per call, so the common case pays one generation-stamped degree
  * scan and nothing else. Scratch arrays are generation-stamped so repeated
  * calls never pay a clear.
  *
  * '''Maximality bookkeeping.''' Removing `u` from `P` without adding it to
  * `X` breaks the invariant "every processed vertex adjacent to all of `R`
  * is in `X`". The break is narrow: `u` is adjacent to `R ∪ S` (`S ⊆ P`)
  * only for `S ⊆ N_P(u)`, i.e. `S = ∅` (degree-0) or `S ⊆ {v}` (degree-1
  * with partner `v`). Hence only the reports of bare `R` and of
  * `R ∪ {v}` are at risk — everything else still has all its extenders in
  * `P ∪ X`. The recursion consumes `removedAny`/`partners` to suppress
  * exactly those (a hoist of ≥2 vertices, or of any non-partner vertex,
  * re-legitimises the report since removed vertices are adjacent to at most
  * one `P` member). The instance is stateful scratch space — one per
  * enumeration run (or per Spark task), never shared across threads.
  */
final class DynamicReduction(n: Int) {
  private val inP = new Array[Int](n)        // stamp: member of current P
  private val removed = new Array[Int](n)    // stamp: dropped from P this call
  private val degP = new Array[Int](n)       // |N(v) ∩ P| for v ∈ P
  private val onlyNbr = new Array[Int](n)    // the single P-neighbour when degP==1
  private val markKnown = new Array[Int](n)  // stamp: mark memoised this call
  private val markVal = new Array[Boolean](n)
  private var gen = 0

  def apply(g: CsrGraph, r: IntStack, p: Array[Int], x: Array[Int],
            report: (Array[Int], Int) => Unit, metrics: Metrics): DynOutcome = {
    if (p.isEmpty) return new DynOutcome(p, x, 0, false, Array.empty)
    gen += 1
    val myGen = gen
    val adj = g.adj
    val off = g.offsets

    var i = 0
    while (i < p.length) { inP(p(i)) = myGen; i += 1 }

    // Degree scan: degP/onlyNbr for every v ∈ P, and whether any vertex can
    // trigger a rule at all (degree 0, 1, or |P|-1).
    var anyLow = false
    var anyFull = false
    i = 0
    while (i < p.length) {
      val v = p(i)
      var d = 0
      var last = -1
      var j = off(v)
      val end = off(v + 1)
      while (j < end) {
        val w = adj(j)
        if (inP(w) == myGen) { d += 1; last = w }
        j += 1
      }
      degP(v) = d
      onlyNbr(v) = last
      if (d <= 1) anyLow = true
      if (d == p.length - 1) anyFull = true
      i += 1
    }

    /** N(v) ∩ X ≠ ∅, memoised per call. */
    def marked(v: Int): Boolean = {
      if (markKnown(v) != myGen) {
        markKnown(v) = myGen
        markVal(v) = IntSets.intersectSize(adj, off(v), off(v + 1), x, 0, x.length) > 0
      }
      markVal(v)
    }

    // Pass 1: dynamic degree-0 (Lemma 5) and relaxed degree-1 (Lemma 7).
    var removedAny = false
    var partners: Array[Int] = null
    var nPartners = 0
    if (anyLow) {
      val buf = new Array[Int](r.size + 2)
      i = 0
      while (i < p.length) {
        val v = p(i)
        if (removed(v) != myGen) {
          if (degP(v) == 0) {
            if (!marked(v)) {
              val len = r.copyInto(buf)
              buf(len) = v
              report(buf, len + 1)
              metrics.preReportedDynamic += 1
            }
            removed(v) = myGen
            removedAny = true
          } else if (degP(v) == 1) {
            val u = onlyNbr(v)
            // u cannot already be removed: a removed degree-0 vertex has no
            // P-neighbour and a removed degree-1 partner implies v is gone
            // too.
            if (!marked(v) || !marked(u)) {
              val len = r.copyInto(buf)
              buf(len) = v; buf(len + 1) = u
              report(buf, len + 2)
              metrics.preReportedDynamic += 1
              removed(v) = myGen
              removedAny = true
              if (degP(u) == 1) removed(u) = myGen // its only neighbour was v
              else {
                // u survives: R ∪ {u} is extendable by the removed v —
                // record it so the recursion suppresses that one report.
                if (partners == null) partners = new Array[Int](p.length)
                partners(nPartners) = u
                nPartners += 1
              }
            }
          }
        }
        i += 1
      }
    }

    var p1 = p
    if (removedAny) {
      var kept = 0
      i = 0
      while (i < p.length) { if (removed(p(i)) != myGen) kept += 1; i += 1 }
      val out = new Array[Int](kept)
      var k = 0
      i = 0
      while (i < p.length) {
        val v = p(i)
        if (removed(v) != myGen) { out(k) = v; k += 1 }
        i += 1
      }
      p1 = out
    }

    // Pass 2: dynamic degree-(|P′|−1) (Lemma 8) over the (possibly shrunk)
    // candidate set. A vertex adjacent to all others stays adjacent to all
    // others as peers get hoisted, so a single scan finds the full hoist
    // set. Degrees are recomputed only if pass 1 removed something;
    // otherwise the first scan's values are still valid.
    var hoisted = 0
    var x1 = x
    if (p1.length > 0 && (anyFull || removedAny)) {
      if (removedAny) {
        gen += 1
        val g2 = gen
        i = 0
        while (i < p1.length) { inP(p1(i)) = g2; i += 1 }
        anyFull = false
        i = 0
        while (i < p1.length) {
          val v = p1(i)
          var d = 0
          var j = off(v)
          val end = off(v + 1)
          while (j < end) { if (inP(adj(j)) == g2) d += 1; j += 1 }
          degP(v) = d
          if (d == p1.length - 1) anyFull = true
          i += 1
        }
      }
      if (anyFull) {
        val keep = new Array[Int](p1.length)
        var k = 0
        i = 0
        while (i < p1.length) {
          val v = p1(i)
          if (degP(v) == p1.length - 1) {
            r.push(v)
            hoisted += 1
            x1 = IntSets.intersect(x1, 0, x1.length, adj, off(v), off(v + 1))
          } else {
            keep(k) = v; k += 1
          }
          i += 1
        }
        p1 = java.util.Arrays.copyOf(keep, k)
      }
    }
    val partnersOut =
      if (partners == null) Engine.EmptyInts
      else java.util.Arrays.copyOf(partners, nPartners)
    new DynOutcome(p1, x1, hoisted, removedAny, partnersOut)
  }
}
