package repro.core

import repro.graph.{CsrGraph, Degeneracy, IntSets}

/** The reduction-based MCE framework (Alg. 4) plus the four BK recursions it
  * wraps. `RmceConfig` selects the recursion and which of the three
  * reduction techniques are active, so the paper's baselines, full RMCE
  * variants, and ablation variants are all configurations of this one
  * engine — guaranteeing that measured differences come from the reductions,
  * not incidental implementation detail.
  */
object Rmce {

  /** Enumerate all maximal cliques of `g0`, reporting into `sink`. */
  def run(g0: CsrGraph, cfg: RmceConfig, sink: CliqueSink): Metrics = {
    val metrics = new Metrics(g0.n)
    run(g0, cfg, sink, metrics)
    metrics
  }

  def run(g0: CsrGraph, cfg: RmceConfig, sink: CliqueSink, metrics: Metrics): Unit = {
    val prepared = prepare(g0, cfg, sink, metrics)
    runRoots(prepared, 0 until prepared.graph.n, cfg, sink, metrics)
  }

  /** The graph after (optional) global reduction, relabelled so vertex ids
    * follow the degeneracy order; `toOrig(label)` maps back to `g0` ids.
    */
  final case class Prepared(graph: CsrGraph, toOrig: Array[Int], degeneracy: Int)

  /** Global reduction + ordering; split out so the distributed driver can
    * broadcast the result and farm `runRoots` out per partition.
    */
  def prepare(g0: CsrGraph, cfg: RmceConfig, sink: CliqueSink, metrics: Metrics): Prepared = {
    val g1 = if (cfg.globalReduction) GlobalReduction(g0, sink, metrics).reduced else g0
    val decomp = Degeneracy.decompose(g1)
    Prepared(g1.relabelled(decomp.order), decomp.order, decomp.degeneracy)
  }

  /** Run a subset of root subproblems (labels in degeneracy order). Safe to
    * call with any subset in any order — reductions' shared state is scoped
    * per call (see [[ForbiddenSetReduction]] on why sharing across an
    * arbitrary root subset stays sound).
    */
  def runRoots(prepared: Prepared, roots: Iterable[Int], cfg: RmceConfig,
               sink: CliqueSink, metrics: Metrics): Unit =
    new Engine(prepared.graph, prepared.toOrig, cfg, sink, metrics).runRoots(roots)
}

private object Engine {
  val EmptyInts: Array[Int] = Array.empty[Int]
  val NoReduction = new DynOutcome(EmptyInts, EmptyInts, 0, false, EmptyInts)
}

/** One enumeration pass: holds reusable scratch state (never share across
  * threads).
  *
  * Report-suppression protocol (see [[DynOutcome]]): `ghost = true` on a
  * call means a vertex removed by the parent's dynamic reduction is
  * adjacent to this call's entire `R`, so the *bare* `R` must not be
  * reported; any extension of `R` (a hoist or a branch) is unaffected
  * because removed vertices are adjacent to at most one candidate.
  */
private final class Engine(
    g: CsrGraph,
    toOrig: Array[Int],
    cfg: RmceConfig,
    sink: CliqueSink,
    metrics: Metrics) {

  private val n = g.n
  private val adj = g.adj
  private val off = g.offsets
  private val dyn = new DynamicReduction(n)
  private val fsr = new ForbiddenSetReduction(n)
  private val r = new IntStack()
  private val reportBuf = new Array[Int](n + 1)

  private val trace = sys.env.contains("RMCE_DEBUG_TRACE")

  /** Translate a label buffer to original ids and report. */
  private val reportLabels: (Array[Int], Int) => Unit = (labels, len) => {
    var i = 0
    while (i < len) { reportBuf(i) = toOrig(labels(i)); i += 1 }
    if (trace) println(s"REPORT ${reportBuf.take(len).mkString(",")}")
    sink.report(reportBuf, len)
  }

  private def traceCall(tag: String, p: Array[Int], x: Array[Int], ghost: Boolean): Unit =
    if (trace) println(s"$tag R=${r.toArray.map(toOrig).mkString(",")} " +
      s"P=${p.map(toOrig).mkString(",")} X=${x.map(toOrig).mkString(",")} ghost=$ghost")

  /** Report `R ∪ extra[0,extraLen)`. */
  private val scratch = new Array[Int](n + 1)
  private def reportRPlus(extra: Array[Int], extraLen: Int): Unit = {
    val rl = r.copyInto(scratch)
    System.arraycopy(extra, 0, scratch, rl, extraLen)
    reportLabels(scratch, rl + extraLen)
  }

  private def visitAll(a: Array[Int]): Unit = {
    var i = 0
    while (i < a.length) { metrics.visit(toOrig(a(i))); i += 1 }
  }

  def runRoots(roots: Iterable[Int]): Unit = {
    roots.foreach { i =>
      if (g.degree(i) > 0) {
        val p = g.laterNeighbors(i)
        var x = g.earlierNeighbors(i)
        metrics.rootSubproblems += 1
        metrics.forbiddenXTotal += x.length
        if (cfg.maximalityReduction) {
          val x1 = fsr.reduceAndUpdate(g, i, p, x)
          if (x1.length < x.length) metrics.forbiddenReducedRoots += 1
          x = x1
        }
        metrics.forbiddenXKept += x.length
        r.clear()
        r.push(i)
        cfg.recursion match {
          case RecursionKind.Degen   => recursePivot(p, x, revised = false, ghost = false)
          case RecursionKind.Revised => recursePivot(p, x, revised = true, ghost = false)
          case RecursionKind.Rcd     => recurseRcd(p, x, ghost = false)
          case RecursionKind.Facen   => new FacenRoot(p, x).run()
        }
      }
    }
  }

  /** Dynamic reduction hook shared by the array-based recursions. */
  private def dynReduce(p: Array[Int], x: Array[Int]): DynOutcome =
    if (cfg.dynamicReduction) dyn.apply(g, r, p, x, reportLabels, metrics)
    else new DynOutcome(p, x, 0, false, Engine.EmptyInts)

  /** May the bare `R` (including `out.hoisted` freshly hoisted vertices) be
    * reported? A hoist of ≥2 vertices, or of any vertex that is not the
    * surviving partner of a removed degree-1 vertex, kills every pending
    * threat (removed vertices are adjacent to at most one candidate; the
    * parent's ghost vertex is adjacent to none of this call's candidates).
    */
  private def bareReportAllowed(out: DynOutcome, ghost: Boolean): Boolean =
    if (out.hoisted == 0) !(ghost || out.removedAny)
    else if (out.hoisted == 1) !out.partnerContains(r(r.size - 1))
    else true

  private def scoreAgainst(u: Int, p: Array[Int]): Int =
    IntSets.intersectSize(adj, off(u), off(u + 1), p, 0, p.length)

  // ---------------------------------------------------------------------
  // BKdegen / BKrevised: pivoted recursion (Alg. 2 lines 4-9). `revised`
  // scans X first, prunes the branch outright when an X vertex dominates
  // all of P (Naudé-style dominance), and prefers X pivots on ties.
  // ---------------------------------------------------------------------
  private def recursePivot(p0: Array[Int], x0: Array[Int], revised: Boolean, ghost: Boolean): Unit = {
    metrics.recursiveCalls += 1
    visitAll(p0); visitAll(x0)
    traceCall("CALL pivot", p0, x0, ghost)
    val out = dynReduce(p0, x0)
    val p = if (cfg.dynamicReduction) out.p else p0
    val x = if (cfg.dynamicReduction) out.x else x0
    traceCall(s"  after-dyn hoisted=${out.hoisted} removed=${out.removedAny} partners=${out.partners.map(toOrig).mkString(",")}", p, x, ghost)
    if (p.isEmpty) {
      if (x.isEmpty && r.size >= 2 && bareReportAllowed(out, ghost))
        reportRPlus(Engine.EmptyInts, 0)
    } else {
      var pivot = -1
      var best = -1
      var barren = false
      if (revised) {
        var i = 0
        while (i < x.length && !barren) {
          val s = scoreAgainst(x(i), p)
          if (s == p.length) barren = true // X vertex adjacent to all of P
          else if (s > best) { best = s; pivot = x(i) }
          i += 1
        }
      }
      if (!barren) {
        var i = 0
        while (i < p.length && best < p.length - 1) {
          val s = scoreAgainst(p(i), p)
          if (s > best) { best = s; pivot = p(i) }
          i += 1
        }
        if (!revised) {
          i = 0
          while (i < x.length && best < p.length) {
            val s = scoreAgainst(x(i), p)
            if (s > best) { best = s; pivot = x(i) }
            i += 1
          }
        }
        val ext = IntSets.diffRange(p, adj, off(pivot), off(pivot + 1))
        var curP = p
        var curX = x
        var k = 0
        while (k < ext.length) {
          val w = ext(k)
          val np = IntSets.intersect(curP, 0, curP.length, adj, off(w), off(w + 1))
          val nx = IntSets.intersect(curX, 0, curX.length, adj, off(w), off(w + 1))
          r.push(w)
          // A hoist kills every partner threat: the removed degree-1 vertex
          // is adjacent to no candidate but its partner, so it cannot be
          // adjacent to a hoisted vertex now sitting in R.
          recursePivot(np, nx, revised, ghost = out.hoisted == 0 && out.partnerContains(w))
          r.pop()
          curP = IntSets.remove(curP, w)
          curX = IntSets.insert(curX, w)
          k += 1
        }
      }
    }
    var h = 0
    while (h < out.hoisted) { r.pop(); h += 1 }
  }

  // ---------------------------------------------------------------------
  // BKrcd (Alg. 3): top-down — peel the candidate with the fewest
  // neighbours in P (recursing into its neighbourhood) until P itself is a
  // clique, then report R ∪ P if it passes the maximality check.
  // ---------------------------------------------------------------------
  private def recurseRcd(p0: Array[Int], x0: Array[Int], ghost: Boolean): Unit = {
    metrics.recursiveCalls += 1
    visitAll(p0); visitAll(x0)
    val out = dynReduce(p0, x0)
    var p = if (cfg.dynamicReduction) out.p else p0
    var x = if (cfg.dynamicReduction) out.x else x0
    var done = false
    while (!done) {
      if (p.isEmpty) {
        if (x.isEmpty && r.size >= 2 && bareReportAllowed(out, ghost))
          reportRPlus(Engine.EmptyInts, 0)
        done = true
      } else {
        var minD = Int.MaxValue
        var argMin = -1
        var i = 0
        while (i < p.length) {
          val d = scoreAgainst(p(i), p)
          if (d < minD) { minD = d; argMin = p(i) }
          i += 1
        }
        if (minD == p.length - 1) {
          // P is a clique; R ∪ P is the only candidate maximal clique here.
          var maximal = true
          i = 0
          while (i < x.length && maximal) {
            if (scoreAgainst(x(i), p) == p.length) maximal = false
            i += 1
          }
          // A vertex removed by this call's dynamic reduction extends
          // R ∪ P only when P is exactly its surviving partner.
          if (out.hoisted == 0 && p.length == 1 && out.partnerContains(p(0)))
            maximal = false
          if (maximal) reportRPlus(p, p.length)
          done = true
        } else {
          val v = argMin
          val np = IntSets.intersect(p, 0, p.length, adj, off(v), off(v + 1))
          val nx = IntSets.intersect(x, 0, x.length, adj, off(v), off(v + 1))
          r.push(v)
          // Hoists kill partner threats (see recursePivot).
          recurseRcd(np, nx, ghost = out.hoisted == 0 && out.partnerContains(v))
          r.pop()
          p = IntSets.remove(p, v)
          x = IntSets.insert(x, v)
        }
      }
    }
    var h = 0
    while (h < out.hoisted) { r.pop(); h += 1 }
  }

  // ---------------------------------------------------------------------
  // BKfacen (Jin et al.): hybrid structure — a partial adjacency matrix
  // over the root's candidate universe P₀ = N⁺(v) (≤ λ vertices) plus
  // bitmask rows for every forbidden vertex, so intersections, pivot
  // scoring, and the dynamic reduction all become word-parallel.
  // ---------------------------------------------------------------------
  private val uIdx = new Array[Int](n)
  private val uStamp = new Array[Int](n)
  private var uGen = 0

  private final class FacenRoot(p0: Array[Int], x0: Array[Int]) {
    private val k = p0.length
    private val w = Bits.words(math.max(1, k))
    private val nSlots = k + x0.length
    private val slotLabel = new Array[Int](nSlots)
    private val masks = new Array[Long](nSlots * w)

    // Universe index: label -> bit position (generation-stamped scratch).
    uGen += 1
    locally {
      var i = 0
      while (i < k) { uIdx(p0(i)) = i; uStamp(p0(i)) = uGen; i += 1 }
      i = 0
      while (i < nSlots) {
        val v = if (i < k) p0(i) else x0(i - k)
        slotLabel(i) = v
        var j = off(v)
        val end = off(v + 1)
        while (j < end) {
          val nb = adj(j)
          if (uStamp(nb) == uGen) Bits.setBit(masks, i * w, uIdx(nb))
          j += 1
        }
        i += 1
      }
    }

    def run(): Unit = {
      val pBits = new Array[Long](w)
      var i = 0
      while (i < k) { Bits.setBit(pBits, 0, i); i += 1 }
      rec(pBits, Array.tabulate(x0.length)(j => k + j), ghost = false)
    }

    private def visitBits(pb: Array[Long]): Unit =
      Bits.forEachBit(pb, 0, w)(ui => metrics.visit(toOrig(slotLabel(ui))))

    /** In-P degrees of the current candidate bits; shared scratch, valid
      * between a call's degree scan and its descent into children (children
      * overwrite it, but it is never read after the ext loop starts).
      */
    private val duScratch = new Array[Int](math.max(1, k))

    private def computeDu(pb: Array[Long]): Unit =
      Bits.forEachBit(pb, 0, w)(u => duScratch(u) = Bits.andPopcount(masks, u * w, pb, 0, w))

    /** Bitset counterpart of [[DynamicReduction]] (same three lemmas, same
      * bookkeeping; partners are recorded as slot labels). Expects
      * `duScratch` to hold in-P degrees for `pb0`, and leaves it holding
      * valid degrees for the returned bitset, so pivot selection reuses the
      * scan instead of recomputing popcounts. `orX` (the mark bits) is only
      * built when a degree-0/1 vertex actually exists.
      */
    private def dynReduceBits(pb0: Array[Long], xs: Array[Int], pSize: Int): (Array[Long], Array[Int], DynOutcome) = {
      var anyLow = false
      var anyFull = false
      Bits.forEachBit(pb0, 0, w) { u =>
        val d = duScratch(u)
        if (d <= 1) anyLow = true
        if (d == pSize - 1) anyFull = true
      }
      if (!anyLow && !anyFull)
        return (pb0, xs, Engine.NoReduction)

      val pb = pb0.clone()
      var removedAny = false
      var partners: Array[Int] = null
      var nPartners = 0
      if (anyLow) {
        val orX = new Array[Long](w)
        var i = 0
        while (i < xs.length) { Bits.orInto(orX, masks, xs(i) * w, w); i += 1 }
        Bits.forEachBit(pb0, 0, w) { u =>
          if (Bits.testBit(pb, 0, u)) { // not yet removed as a pair partner
            val du = duScratch(u)
            if (du == 0) {
              if (!Bits.testBit(orX, 0, u)) {
                val len = r.copyInto(scratch)
                scratch(len) = slotLabel(u)
                reportLabels(scratch, len + 1)
                metrics.preReportedDynamic += 1
              }
              Bits.clearBit(pb, 0, u)
              removedAny = true
            } else if (du == 1) {
              val v = Bits.singleBitOfAnd(masks, u * w, pb0, 0, w)
              if (!Bits.testBit(orX, 0, u) || !Bits.testBit(orX, 0, v)) {
                val len = r.copyInto(scratch)
                scratch(len) = slotLabel(u); scratch(len + 1) = slotLabel(v)
                reportLabels(scratch, len + 2)
                metrics.preReportedDynamic += 1
                Bits.clearBit(pb, 0, u)
                removedAny = true
                if (duScratch(v) == 1) Bits.clearBit(pb, 0, v)
                else {
                  if (partners == null) partners = new Array[Int](k)
                  partners(nPartners) = slotLabel(v)
                  nPartners += 1
                }
              }
            }
          }
        }
      }
      // Degree-(|P'|-1) hoisting (degrees recomputed only if pass 1 removed
      // anything; a pure hoist shifts every survivor's degree by the same
      // constant, patched below).
      if (removedAny) computeDu(pb)
      val kNow = if (removedAny) Bits.popcount(pb, 0, w) else pSize
      var hoisted = 0
      var xsOut = xs
      if (kNow > 0) {
        val toHoist = new Array[Int](kNow)
        var hn = 0
        Bits.forEachBit(pb, 0, w) { u =>
          if (duScratch(u) == kNow - 1) { toHoist(hn) = u; hn += 1 }
        }
        if (hn > 0) {
          var j = 0
          while (j < hn) {
            val u = toHoist(j)
            r.push(slotLabel(u))
            Bits.clearBit(pb, 0, u)
            j += 1
          }
          hoisted = hn
          Bits.forEachBit(pb, 0, w)(u => duScratch(u) -= hn)
          xsOut = xs.filter { s =>
            var ok = true
            var t = 0
            while (t < hn && ok) { ok = Bits.testBit(masks, s * w, toHoist(t)); t += 1 }
            ok
          }
        }
      }
      val partnersOut =
        if (partners == null) Engine.EmptyInts
        else java.util.Arrays.copyOf(partners, nPartners)
      (pb, xsOut, new DynOutcome(Engine.EmptyInts, Engine.EmptyInts, hoisted, removedAny, partnersOut))
    }

    private def rec(pBits: Array[Long], xSlots: Array[Int], ghost: Boolean): Unit = {
      metrics.recursiveCalls += 1
      visitBits(pBits)
      var i = 0
      while (i < xSlots.length) { metrics.visit(toOrig(slotLabel(xSlots(i)))); i += 1 }

      var pb = pBits
      var xs = xSlots
      var out = Engine.NoReduction
      if (!Bits.isEmpty(pb, 0, w)) {
        computeDu(pb)
        if (cfg.dynamicReduction) {
          val t = dynReduceBits(pb, xs, Bits.popcount(pb, 0, w))
          pb = t._1; xs = t._2; out = t._3
        }
      }
      if (Bits.isEmpty(pb, 0, w)) {
        if (xs.isEmpty && r.size >= 2 && bareReportAllowed(out, ghost))
          reportRPlus(Engine.EmptyInts, 0)
      } else {
        val pSize = Bits.popcount(pb, 0, w)
        var pivot = -1
        var best = -1
        // P-side pivot scores come straight from the degree scan.
        Bits.forEachBit(pb, 0, w) { u =>
          if (best < pSize - 1 && duScratch(u) > best) { best = duScratch(u); pivot = u }
        }
        i = 0
        while (i < xs.length && best < pSize) {
          val s = Bits.andPopcount(masks, xs(i) * w, pb, 0, w)
          if (s > best) { best = s; pivot = xs(i) }
          i += 1
        }
        val ext = new Array[Long](w)
        var t = 0
        while (t < w) { ext(t) = pb(t) & ~masks(pivot * w + t); t += 1 }
        val curP = pb.clone()
        var curX = xs
        Bits.forEachBit(ext, 0, w) { wi =>
          val np = Bits.and(curP, 0, masks, wi * w, w)
          val nxB = Array.newBuilder[Int]
          var j = 0
          while (j < curX.length) {
            if (Bits.testBit(masks, curX(j) * w, wi)) nxB += curX(j)
            j += 1
          }
          r.push(slotLabel(wi))
          // Hoists kill partner threats (see recursePivot).
          rec(np, nxB.result(), ghost = out.hoisted == 0 && out.partnerContains(slotLabel(wi)))
          r.pop()
          Bits.clearBit(curP, 0, wi)
          curX = curX :+ wi
        }
      }
      var h = 0
      while (h < out.hoisted) { r.pop(); h += 1 }
    }
  }
}
