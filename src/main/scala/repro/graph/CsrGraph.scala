package repro.graph

import scala.collection.mutable

/** Immutable undirected graph in CSR (compressed sparse row) form.
  *
  * Vertices are `0 until n`; `adj` holds each vertex's neighbours as a
  * sorted, duplicate-free run `adj[offsets(v), offsets(v+1))`. `split(v)`
  * is the index inside that run where neighbours with id `> v` start, so
  * when vertex ids encode a vertex order (as after
  * [[CsrGraph.relabelled]]), `N⁻(v)` and `N⁺(v)` are the two halves of the
  * run — exactly the `X`/`P` initialisation of degeneracy-ordered
  * Bron–Kerbosch (Alg. 2 of the paper).
  */
final class CsrGraph private (
    val n: Int,
    val offsets: Array[Int],
    val adj: Array[Int]) extends Serializable {

  /** Number of undirected edges. */
  val m: Long = adj.length / 2L

  /** Index in `adj` of the first neighbour of `v` greater than `v`. */
  val split: Array[Int] = {
    val s = new Array[Int](n)
    var v = 0
    while (v < n) {
      var i = offsets(v)
      val end = offsets(v + 1)
      while (i < end && adj(i) < v) i += 1
      s(v) = i
      v += 1
    }
    s
  }

  def degree(v: Int): Int = offsets(v + 1) - offsets(v)

  /** Sorted neighbour list of `v` as a fresh array. */
  def neighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(adj, offsets(v), offsets(v + 1))

  /** Later neighbours `N⁺(v)` (ids greater than `v`) as a fresh array. */
  def laterNeighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(adj, split(v), offsets(v + 1))

  /** Earlier neighbours `N⁻(v)` (ids smaller than `v`) as a fresh array. */
  def earlierNeighbors(v: Int): Array[Int] =
    java.util.Arrays.copyOfRange(adj, offsets(v), split(v))

  def laterDegree(v: Int): Int = offsets(v + 1) - split(v)

  def hasEdge(u: Int, v: Int): Boolean =
    IntSets.contains(adj, offsets(u), offsets(u + 1), v)

  def maxDegree: Int = {
    var best = 0
    var v = 0
    while (v < n) { val d = degree(v); if (d > best) best = d; v += 1 }
    best
  }

  /** All undirected edges, oriented `u < v`. */
  def edges: Array[(Int, Int)] = {
    val out = mutable.ArrayBuffer.empty[(Int, Int)]
    var v = 0
    while (v < n) {
      var i = split(v)
      val end = offsets(v + 1)
      while (i < end) { out += ((v, adj(i))); i += 1 }
      v += 1
    }
    out.toArray
  }

  /** Graph with vertices renumbered so that old vertex `order(i)` becomes
    * new vertex `i`; used to bake a degeneracy order into vertex ids.
    */
  def relabelled(order: Array[Int]): CsrGraph = {
    require(order.length == n, s"order has ${order.length} entries, graph has $n vertices")
    val pos = new Array[Int](n)
    var i = 0
    while (i < n) { pos(order(i)) = i; i += 1 }
    CsrGraph.fromEdges(n, edges.map { case (u, v) => (pos(u), pos(v)) })
  }
}

object CsrGraph {

  /** Build from an arbitrary undirected edge list over vertices `0 until n`.
    * Self-loops are dropped; duplicate edges are collapsed. Counting-sort
    * construction — no per-vertex boxed collections on the graph-rebuild
    * path (global reduction and relabelling both rebuild CSRs).
    */
  def fromEdges(n: Int, rawEdges: Iterable[(Int, Int)]): CsrGraph = {
    val count = new Array[Int](n + 1)
    rawEdges.foreach { case (u, v) =>
      require(u >= 0 && u < n && v >= 0 && v < n, s"edge ($u,$v) outside [0,$n)")
      if (u != v) { count(u + 1) += 1; count(v + 1) += 1 }
    }
    var v = 0
    while (v < n) { count(v + 1) += count(v); v += 1 }
    val fill = java.util.Arrays.copyOf(count, n + 1)
    val raw = new Array[Int](count(n))
    rawEdges.foreach { case (a, b) =>
      if (a != b) {
        raw(fill(a)) = b; fill(a) += 1
        raw(fill(b)) = a; fill(b) += 1
      }
    }
    // Sort each row, then compact duplicates row by row.
    val offsets = new Array[Int](n + 1)
    val adj = new Array[Int](raw.length)
    var w = 0
    v = 0
    while (v < n) {
      val from = count(v); val until = count(v + 1)
      java.util.Arrays.sort(raw, from, until)
      offsets(v) = w
      var i = from
      var prev = -1
      while (i < until) {
        val x = raw(i)
        if (x != prev) { adj(w) = x; w += 1; prev = x }
        i += 1
      }
      v += 1
    }
    offsets(n) = w
    new CsrGraph(n, offsets, if (w == adj.length) adj else java.util.Arrays.copyOf(adj, w))
  }

  /** Build from a Long edge list (e.g. collected from a Spark DataFrame),
    * compacting arbitrary ids to `0 until n`. Returns the graph and the
    * new-id → original-id mapping.
    */
  def fromLongEdges(rawEdges: Iterable[(Long, Long)]): (CsrGraph, Array[Long]) = {
    val ids = mutable.SortedSet.empty[Long]
    rawEdges.foreach { case (u, v) => if (u != v) { ids += u; ids += v } }
    val toOrig = ids.toArray
    val toNew = toOrig.zipWithIndex.toMap
    val g = fromEdges(toOrig.length,
      rawEdges.collect { case (u, v) if u != v => (toNew(u), toNew(v)) })
    (g, toOrig)
  }
}
