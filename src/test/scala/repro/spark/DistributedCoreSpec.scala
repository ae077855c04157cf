package repro.spark

import org.apache.spark.sql.DataFrame
import repro.SparkSpec
import repro.graph.{CsrGraph, Degeneracy}

class DistributedCoreSpec extends SparkSpec {

  private def df(edges: Seq[(Int, Int)]): DataFrame = {
    val s = spark
    import s.implicits._
    edges.map(e => (e._1.toLong, e._2.toLong)).toDF("src", "dst")
  }

  private def check(edges: Seq[(Int, Int)], n: Int, label: String): Unit = {
    val local = Degeneracy.decompose(CsrGraph.fromEdges(n, edges))
    val dist = DistributedCore.coreNumbers(spark, df(edges))
    assert(dist.degeneracy == local.degeneracy, s"$label: λ mismatch")
    dist.cores.foreach { case (v, c) =>
      assert(c == local.core(v.toInt), s"$label: core($v) = $c, local ${local.core(v.toInt)}")
    }
    // Every edge-touched vertex got a core number.
    val touched = edges.flatMap(e => Seq(e._1, e._2)).toSet
    assert(dist.cores.keySet.map(_.toInt) == touched, s"$label: vertex coverage")
  }

  test("distributed core numbers match the local peel on fixed graphs") {
    check(Seq((0, 1), (1, 2), (2, 3), (3, 4)), 5, "path")
    check((0 until 6).map(i => (i, (i + 1) % 6)), 6, "cycle")
    check(for (i <- 0 until 5; j <- (i + 1) until 5) yield (i, j), 5, "k5")
    check(Seq((0, 1), (0, 2), (1, 2), (2, 3)), 4, "paw")
  }

  test("distributed core numbers match the local peel on random graphs") {
    for (seed <- 1 to 3) {
      val g = repro.gen.GraphGen.erdosRenyi(60, 5.0, seed)
      check(g.edges.toSeq, g.n, s"gnm-$seed")
    }
  }

  test("degeneracy of a mixed-regime graph") {
    val core = repro.gen.GraphGen.triangularTorus(5, 5)
    val g = repro.gen.GraphGen.withFringe(core, 10, 5, 3)
    check(g.edges.toSeq, g.n, "torus+fringe")
  }

  test("empty edge set yields degeneracy 0") {
    val r = DistributedCore.coreNumbers(spark, df(Seq.empty))
    assert(r.degeneracy == 0 && r.cores.isEmpty)
  }
}
