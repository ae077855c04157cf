package repro.spark

import org.apache.spark.sql.DataFrame
import repro.{Oracle, SparkSpec}

/** DataFrame graph ops checked row-for-row against DuckDB SQL over the same
  * edge tables (the repo's correctness oracle).
  */
class GraphOpsSpec extends SparkSpec {

  private def df(edges: Seq[(Long, Long)]): DataFrame = {
    val s = spark
    import s.implicits._
    edges.toDF("src", "dst")
  }

  private val raw = df(Seq((1L, 2L), (2L, 1L), (3L, 3L), (2L, 3L), (3L, 4L),
    (4L, 1L), (4L, 2L), (10L, 2L)))

  test("canonicalEdges matches DuckDB DISTINCT/LEAST/GREATEST") {
    val got = GraphOps.canonicalEdges(raw)
    Oracle.assertEquivalent(
      got,
      """SELECT DISTINCT
        |  LEAST(CAST(src AS BIGINT), CAST(dst AS BIGINT)) AS src,
        |  GREATEST(CAST(src AS BIGINT), CAST(dst AS BIGINT)) AS dst
        |FROM e
        |WHERE CAST(src AS BIGINT) <> CAST(dst AS BIGINT)""".stripMargin,
      "e" -> raw)
  }

  test("degrees match DuckDB group-by over the symmetric closure") {
    val canon = GraphOps.canonicalEdges(raw)
    Oracle.assertEquivalent(
      GraphOps.degrees(canon),
      """WITH sym AS (
        |  SELECT CAST(src AS BIGINT) AS v, CAST(dst AS BIGINT) AS w FROM e
        |  UNION ALL
        |  SELECT CAST(dst AS BIGINT), CAST(src AS BIGINT) FROM e)
        |SELECT v, COUNT(*) AS degree FROM sym GROUP BY v""".stripMargin,
      "e" -> canon)
  }

  test("edgeSupport matches DuckDB common-neighbour counts (incl. zero)") {
    val canon = GraphOps.canonicalEdges(raw)
    Oracle.assertEquivalent(
      GraphOps.edgeSupport(canon),
      """WITH sym AS (
        |  SELECT CAST(src AS BIGINT) AS u, CAST(dst AS BIGINT) AS w FROM e
        |  UNION ALL
        |  SELECT CAST(dst AS BIGINT), CAST(src AS BIGINT) FROM e),
        |tri AS (
        |  SELECT a.u AS src, b.u AS dst, COUNT(*) AS c
        |  FROM sym a JOIN sym b ON a.w = b.w
        |  WHERE a.u < b.u
        |  GROUP BY a.u, b.u)
        |SELECT CAST(e.src AS BIGINT) AS src, CAST(e.dst AS BIGINT) AS dst,
        |       COALESCE(tri.c, 0) AS support
        |FROM e LEFT JOIN tri
        |  ON CAST(e.src AS BIGINT) = tri.src AND CAST(e.dst AS BIGINT) = tri.dst""".stripMargin,
      "e" -> canon)
  }

  test("edgeSupport on a clique-rich stand-in matches DuckDB") {
    val g = repro.gen.GraphGen.cliqueUnion(60, 25, 3, 5, 0.3, 21)
    val edges = df(g.edges.toSeq.map(e => (e._1.toLong, e._2.toLong)))
    Oracle.assertEquivalent(
      GraphOps.edgeSupport(edges),
      """WITH sym AS (
        |  SELECT CAST(src AS BIGINT) AS u, CAST(dst AS BIGINT) AS w FROM e
        |  UNION ALL
        |  SELECT CAST(dst AS BIGINT), CAST(src AS BIGINT) FROM e),
        |tri AS (
        |  SELECT a.u AS src, b.u AS dst, COUNT(*) AS c
        |  FROM sym a JOIN sym b ON a.w = b.w
        |  WHERE a.u < b.u
        |  GROUP BY a.u, b.u)
        |SELECT CAST(e.src AS BIGINT) AS src, CAST(e.dst AS BIGINT) AS dst,
        |       COALESCE(tri.c, 0) AS support
        |FROM e LEFT JOIN tri
        |  ON CAST(e.src AS BIGINT) = tri.src AND CAST(e.dst AS BIGINT) = tri.dst""".stripMargin,
      "e" -> edges)
  }

  test("triangleCount: known values") {
    assert(GraphOps.triangleCount(df(Seq((0L, 1L), (1L, 2L), (0L, 2L)))) == 1L)
    assert(GraphOps.triangleCount(df(Seq((0L, 1L), (1L, 2L), (2L, 3L)))) == 0L)
    // K4 has 4 triangles
    val k4 = df(for { i <- 0 to 3; j <- (i + 1) to 3 } yield (i.toLong, j.toLong))
    assert(GraphOps.triangleCount(k4) == 4L)
  }

  test("triangleCount matches CSR-side count on a random graph") {
    val g = repro.gen.GraphGen.erdosRenyi(80, 8.0, 17)
    val csr = g.toCsr
    var local = 0L
    for ((u, v) <- g.edges)
      local += repro.graph.IntSets.intersectSize(csr.neighbors(u), csr.neighbors(v))
    val edges = df(g.edges.toSeq.map(e => (e._1.toLong, e._2.toLong)))
    assert(GraphOps.triangleCount(edges) == local / 3)
  }

  test("basicStats") {
    val (n, m, dmax) = GraphOps.basicStats(raw)
    // canonical edges: (1,2),(2,3),(3,4),(1,4),(2,4),(2,10)
    assert(n == 5L && m == 6L && dmax == 4L)
  }

  test("symmetric doubles canonical edge count") {
    val canon = GraphOps.canonicalEdges(raw)
    assert(GraphOps.symmetric(raw).count() == 2 * canon.count())
  }
}
