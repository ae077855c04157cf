package repro.core

import repro.graph.CsrGraph
import scala.collection.mutable

/** Global reduction (Section 4): low-degree vertex reduction (Alg. 5,
  * Lemmas 1–3) interleaved with non-triangle edge reduction (Alg. 6,
  * Lemma 4) until a joint fix-point.
  *
  * Every deleted vertex/edge has its maximal cliques reported to the sink
  * *before* deletion, preserving the invariant
  * `mc(G) = mc(G′) + α(ΔV, ΔE)`. The fix-point interleave is the paper's
  * Example 4 ("after deleting edges (u4,v5),(v5,u8), vertex v5 becomes a new
  * degree-two vertex") taken to completion: edge deletions re-feed the
  * low-degree queue and vertex deletions can expose new non-triangle edges.
  * Iterating to a joint fix-point only *increases* the reduction yield;
  * each rule application is justified against the current graph, so the
  * invariant is unaffected.
  *
  * Representation: the original CSR stays immutable. Edge deletions flip a
  * boolean in a per-directed-slot array (no hashing — edge keys built as
  * `u<<32|v` collapse to ~`u^v` under `Long.hashCode`, which degenerates
  * catastrophically on lattice graphs), vertex deletions flip a flag, and
  * degrees are maintained as counters. The non-triangle rule runs as one
  * full pass with the paper's visited-triangle marking, then a dirty queue
  * re-probes only edges whose support can actually have changed, keeping
  * the whole reduction near-linear in practice (O(m·d_max) worst case, the
  * paper's Section 4 bound).
  *
  * The reduced graph keeps the original vertex-id space: deleted vertices
  * simply become isolated (the enumeration root loop skips degree-0
  * vertices, consistent with the paper's ≥2-vertex clique convention).
  */
object GlobalReduction {

  final case class Result(reduced: CsrGraph, deletedVertices: Int, deletedEdges: Long)

  def apply(g: CsrGraph, sink: CliqueSink, metrics: Metrics): Result = {
    val n = g.n
    val adj = g.adj
    val off = g.offsets
    val deg = Array.tabulate(n)(g.degree)
    val removedV = new Array[Boolean](n)
    val removedSlot = new Array[Boolean](adj.length) // per directed edge slot
    val buf = new Array[Int](3)
    var deletedVertices = 0

    /** Position of `b` in `a`'s sorted adjacency row, or -1. */
    def posOf(a: Int, b: Int): Int = {
      var lo = off(a)
      var hi = off(a + 1) - 1
      while (lo <= hi) {
        val mid = (lo + hi) >>> 1
        val v = adj(mid)
        if (v == b) return mid
        else if (v < b) lo = mid + 1
        else hi = mid - 1
      }
      -1
    }

    def edgeAlive(a: Int, b: Int): Boolean = {
      if (removedV(a) || removedV(b)) return false
      val p = posOf(a, b)
      p >= 0 && !removedSlot(p)
    }

    def report2(a: Int, b: Int): Unit = {
      buf(0) = a; buf(1) = b
      sink.report(buf, 2)
      metrics.preReportedGlobal += 1
    }
    def report3(a: Int, b: Int, c: Int): Unit = {
      buf(0) = a; buf(1) = b; buf(2) = c
      sink.report(buf, 3)
      metrics.preReportedGlobal += 1
    }

    val queue = mutable.ArrayDeque.empty[Int]
    val inQueue = new Array[Boolean](n)
    def enqueueIfLow(v: Int): Unit =
      if (!removedV(v) && !inQueue(v) && deg(v) <= 2) {
        queue.append(v); inQueue(v) = true
      }

    // Dirty queue: canonical slots (u < adj(slot)) whose triangle support
    // may have changed and must be re-probed by the non-triangle rule.
    val dirty = mutable.ArrayDeque.empty[Long] // (u << 32) | v, u < v
    val inDirty = new Array[Boolean](adj.length) // indexed by canonical slot
    def markDirty(u0: Int, v0: Int): Unit = {
      val u = math.min(u0, v0)
      val v = math.max(u0, v0)
      if (!removedV(u) && !removedV(v)) {
        val p = posOf(u, v)
        if (p >= 0 && !removedSlot(p) && !inDirty(p)) {
          inDirty(p) = true
          dirty.append((u.toLong << 32) | v.toLong)
        }
      }
    }
    def removeEdge(u: Int, v: Int): Unit = {
      // Deleting (u,v) can only break triangles (u,v,z): exactly the edges
      // (u,z) and (v,z) for live common neighbours z need a re-probe (a
      // non-triangle edge has none, so its removal enqueues nothing).
      var i = off(u); val iEnd = off(u + 1)
      var j = off(v); val jEnd = off(v + 1)
      while (i < iEnd && j < jEnd) {
        val a = adj(i); val b = adj(j)
        if (a == b) {
          if (!removedV(a) && !removedSlot(i) && !removedSlot(j)) {
            markDirty(u, a); markDirty(v, a)
          }
          i += 1; j += 1
        } else if (a < b) i += 1
        else j += 1
      }
      removedSlot(posOf(u, v)) = true
      removedSlot(posOf(v, u)) = true
      deg(u) -= 1; deg(v) -= 1
      enqueueIfLow(u); enqueueIfLow(v)
    }

    def removeVertex(v: Int): Unit = {
      var i = off(v)
      val end = off(v + 1)
      while (i < end) {
        val u = adj(i)
        if (!removedSlot(i) && !removedV(u)) {
          deg(u) -= 1
          enqueueIfLow(u)
        }
        i += 1
      }
      removedV(v) = true
      deletedVertices += 1
    }

    /** The (up to) two live neighbours of a degree-≤2 vertex. */
    val nbr2 = new Array[Int](2)
    def liveNeighbors2(v: Int): Int = {
      var k = 0
      var i = off(v)
      val end = off(v + 1)
      while (i < end && k < 2) {
        val u = adj(i)
        if (!removedSlot(i) && !removedV(u)) { nbr2(k) = u; k += 1 }
        i += 1
      }
      k
    }

    /** One live common neighbour of u and v other than `skip`, or -1. The
      * merge walks both rows by position, so liveness checks are O(1);
      * heavily skewed pairs (hub edges) switch to probing the small row's
      * entries into the large row by binary search.
      */
    def commonNeighbor(u: Int, v: Int, skip: Int): Int = {
      val du = off(u + 1) - off(u)
      val dv = off(v + 1) - off(v)
      if (du > 16 * dv || dv > 16 * du) {
        val small = if (du <= dv) u else v
        val large = if (du <= dv) v else u
        var i = off(small)
        val end = off(small + 1)
        while (i < end) {
          val a = adj(i)
          if (a != skip && !removedSlot(i) && !removedV(a)) {
            val p = posOf(large, a)
            if (p >= 0 && !removedSlot(p)) return a
          }
          i += 1
        }
        -1
      } else {
        var i = off(u); val iEnd = off(u + 1)
        var j = off(v); val jEnd = off(v + 1)
        while (i < iEnd && j < jEnd) {
          val a = adj(i); val b = adj(j)
          if (a == b) {
            if (a != skip && !removedV(a) && !removedSlot(i) && !removedSlot(j)) return a
            i += 1; j += 1
          } else if (a < b) i += 1
          else j += 1
        }
        -1
      }
    }

    /** Alg. 5 over the pending queue (handles cascades). */
    def vertexReduction(): Unit = {
      while (queue.nonEmpty) {
        val v = queue.removeHead()
        inQueue(v) = false
        if (!removedV(v)) {
          val d = deg(v)
          if (d == 0) {
            // Lemma 1 — all its cliques were reported when its edges went.
            if (g.degree(v) > 0) removeVertex(v)
          } else if (d == 1) {
            // Lemma 2: {v,u} is a maximal 2-clique.
            liveNeighbors2(v)
            val u = nbr2(0)
            report2(v, u)
            removeVertex(v)
          } else if (d == 2) {
            // Lemma 3, three scenarios.
            liveNeighbors2(v)
            val u = nbr2(0); val w = nbr2(1)
            if (!edgeAlive(u, w)) {
              report2(v, u); report2(v, w)
              removeVertex(v)
            } else if (commonNeighbor(u, w, skip = v) < 0) {
              // {v,u,w} is the last clique over edge (u,w): delete it too so
              // {u,w} is never reported as a (non-maximal) 2-clique later.
              report3(v, u, w)
              removeVertex(v)
              removeEdge(u, w)
            } else {
              report3(v, u, w)
              removeVertex(v)
              // (u,w) survives but v was one of its triangle witnesses.
              markDirty(u, w)
            }
          }
        }
      }
    }

    /** Alg. 6, single full pass with the paper's visited-triangle marking:
      * once an edge is seen inside a triangle, its two sibling edges need
      * no probe of their own this pass. Later support changes are handled
      * by the dirty queue, not by re-scanning. `visited` is indexed by
      * canonical slot (the u→v direction with u < v).
      */
    def initialEdgePass(): Unit = {
      val visited = new Array[Boolean](adj.length)
      def markVisited(a0: Int, b0: Int): Unit = {
        val a = math.min(a0, b0); val b = math.max(a0, b0)
        val p = posOf(a, b)
        if (p >= 0) visited(p) = true
      }
      var u = 0
      while (u < n) {
        if (!removedV(u)) {
          var i = off(u)
          val end = off(u + 1)
          while (i < end) {
            val v = adj(i)
            if (u < v && !visited(i) && !removedSlot(i) && !removedV(v)) {
              val c = commonNeighbor(u, v, skip = -1)
              if (c < 0) {
                report2(u, v)
                removeEdge(u, v)
              } else {
                visited(i) = true
                markVisited(u, c)
                markVisited(v, c)
              }
            }
            i += 1
          }
        }
        u += 1
      }
    }

    /** Re-probe edges whose support may have changed. */
    def processDirty(): Unit = {
      while (dirty.nonEmpty) {
        val k = dirty.removeHead()
        val u = (k >>> 32).toInt
        val v = (k & 0xFFFFFFFFL).toInt
        val p = posOf(u, v)
        if (p >= 0) inDirty(p) = false
        if (edgeAlive(u, v) && commonNeighbor(u, v, skip = -1) < 0) {
          report2(u, v)
          removeEdge(u, v)
        }
      }
    }

    // Low-degree peel, one full edge pass, then localised re-probes to a
    // joint fix-point.
    var v = 0
    while (v < n) { enqueueIfLow(v); v += 1 }
    vertexReduction()
    initialEdgePass()
    while (queue.nonEmpty || dirty.nonEmpty) {
      vertexReduction()
      processDirty()
    }

    val reducedEdges = mutable.ArrayBuffer.empty[(Int, Int)]
    v = 0
    while (v < n) {
      if (!removedV(v)) {
        var i = off(v)
        val end = off(v + 1)
        while (i < end) {
          val u = adj(i)
          if (v < u && !removedSlot(i) && !removedV(u)) reducedEdges += ((v, u))
          i += 1
        }
      }
      v += 1
    }
    val reduced = CsrGraph.fromEdges(n, reducedEdges)
    metrics.globalDeletedVertices += deletedVertices
    metrics.globalDeletedEdges += (g.m - reduced.m)
    Result(reduced, deletedVertices, g.m - reduced.m)
  }
}
