package repro.spark

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.core.BruteForce
import repro.graph.CsrGraph

/** The distributed global reduction must satisfy the same invariant as the
  * local one: `mc(G) = mc(G′) + α`, with every pre-report maximal in `G`
  * and no duplicates.
  */
class DistributedReductionSpec extends SparkSpec {

  private def df(edges: Seq[(Int, Int)]): DataFrame = {
    val s = spark
    import s.implicits._
    edges.map(e => (e._1.toLong, e._2.toLong)).toDF("src", "dst")
  }

  private def invariant(edges: Seq[(Int, Int)], n: Int, label: String): DistributedReduction.Result = {
    val g = CsrGraph.fromEdges(n, edges)
    val res = DistributedReduction(spark, df(edges))
    val pre = res.cliques.map(_.map(_.toInt).toSet)
    assert(pre.size == pre.toSet.size, s"$label: duplicate pre-reports")
    pre.foreach(c => assert(BruteForce.isMaximalClique(g, c), s"$label: $c not maximal in G"))
    val reducedPairs = res.reducedEdges.collect().map(r => (r.getLong(0).toInt, r.getLong(1).toInt))
    val gReduced = CsrGraph.fromEdges(n, reducedPairs.toSeq)
    val rest = BruteForce.maximalCliques(gReduced)
    assert(rest.intersect(pre.toSet).isEmpty, s"$label: double-counted clique")
    assert(rest ++ pre == BruteForce.maximalCliques(g), s"$label: union mismatch")
    res
  }

  test("invariant on fixed graphs") {
    invariant(Seq((0, 1), (1, 2), (2, 3), (3, 4)), 5, "path")
    invariant(Seq((0, 1), (0, 2), (1, 2), (2, 3)), 4, "paw")
    invariant(Seq((0, 1), (0, 2), (0, 3), (0, 4)), 5, "star")
    invariant(for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j), 5, "k5")
    invariant(Seq((0, 1), (0, 2), (1, 2), (1, 3), (2, 3)), 4, "diamond")
  }

  test("invariant on random sparse graphs") {
    for (seed <- 1 to 4) {
      val g = repro.gen.GraphGen.erdosRenyi(30, 2.5, seed)
      invariant(g.edges.toSeq, g.n, s"sparse-$seed")
    }
  }

  test("invariant on mixed-regime graphs") {
    for (seed <- 1 to 3) {
      val g = repro.core.TestGraphs.mixed(seed)
      invariant(g.edges.toSeq.map(e => (e._1, e._2)), g.n, s"mixed-$seed")
    }
  }

  test("grid graph fully deleted (paper: inf-road-usa, roadNet-CA)") {
    val g = repro.gen.GraphGen.grid2d(7, 9)
    val res = invariant(g.edges.toSeq, g.n, "grid")
    assert(res.reducedEdges.count() == 0)
    assert(res.deletedVertices == g.n)
    assert(res.cliques.size.toLong == g.edges.length)
  }

  test("triangular torus untouched (paper: sc-delaunay_n23)") {
    val g = repro.gen.GraphGen.triangularTorus(5, 6)
    val res = DistributedReduction(spark, df(g.edges.toSeq))
    assert(res.deletedVertices == 0 && res.deletedEdges == 0)
    assert(res.cliques.isEmpty)
  }

  test("deleted counts are consistent") {
    val g = repro.core.TestGraphs.mixed(11)
    val res = DistributedReduction(spark, df(g.edges.toSeq.map(e => (e._1, e._2))))
    assert(res.deletedEdges == g.m - res.reducedEdges.count())
    assert(res.deletedVertices >= 0 && res.deletedVertices <= g.n)
  }
}
