package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core._
import repro.graph.{CsrGraph, Degeneracy}

/** Counting sink over an id-translation table: labels arriving from the
  * kernel are compact ids; the sink hashes the original Long ids so local
  * and distributed runs over the same DataFrame produce identical
  * checksums.
  */
final class LongCountingSink(toLong: Array[Long]) extends CliqueSink with Serializable {
  var count: Long = 0L
  var checksum: Long = 0L
  var maxSize: Int = 0

  override def report(vertices: Array[Int], len: Int): Unit = {
    count += 1
    var s = 0L
    var x = 0L
    var i = 0
    while (i < len) {
      val h = CliqueSink.mix64(toLong(vertices(i)))
      s += h
      x ^= h
      i += 1
    }
    checksum += CliqueSink.mix64(s ^ java.lang.Long.rotateLeft(x, 32) ^ len.toLong)
    if (len > maxSize) maxSize = len
  }
}

/** Distributed maximal clique enumeration: the paper's RMCE pipeline as a
  * Spark dataflow.
  *
  *  1. global reduction runs as a DataFrame fix-point
  *     ([[DistributedReduction]]) with its maximal cliques reported up
  *     front;
  *  2. the reduced graph (typically a small fraction of the input) is
  *     collected, degeneracy-ordered, and broadcast as a CSR;
  *  3. root subproblems `(v, N⁺(v), N⁻(v))` are farmed round-robin over
  *     partitions; each task runs the exact local kernel with dynamic and
  *     maximality-check reductions (the per-partition `ignoreId` reuse is
  *     sound — see [[repro.core.ForbiddenSetReduction]]);
  *  4. clique counts, order-independent checksums, and instrumentation
  *     metrics are reduced back to the driver.
  */
object DistributedMCE {

  final case class Result(
      cliqueCount: Long,
      checksum: Long,
      preReportedGlobal: Long,
      deletedVertices: Long,
      deletedEdges: Long,
      reducedN: Int,
      degeneracy: Int,
      metrics: Metrics)

  private def cliqueHashLongs(vs: Array[Long]): Long = {
    var s = 0L
    var x = 0L
    var i = 0
    while (i < vs.length) {
      val h = CliqueSink.mix64(vs(i))
      s += h
      x ^= h
      i += 1
    }
    CliqueSink.mix64(s ^ java.lang.Long.rotateLeft(x, 32) ^ vs.length.toLong)
  }

  /** Run the full distributed pipeline. */
  def run(spark: SparkSession, edgesDf: DataFrame, cfg: RmceConfig,
          numTasks: Int = 0): Result = {
    val canon = GraphOps.canonicalEdges(edgesDf)
    val (workEdges, preCliques, delV, delE) =
      if (cfg.globalReduction) {
        val r = DistributedReduction(spark, canon)
        (r.reducedEdges, r.cliques, r.deletedVertices, r.deletedEdges)
      } else (canon, Seq.empty[Array[Long]], 0L, 0L)

    val pairs = workEdges.select("src", "dst").collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSeq
    val (g, toOrigLong) = CsrGraph.fromLongEdges(pairs)
    val decomp = Degeneracy.decompose(g)
    val prepared = Rmce.Prepared(g.relabelled(decomp.order), decomp.order, decomp.degeneracy)
    val n = prepared.graph.n

    val sc = spark.sparkContext
    val tasks = math.max(1, if (numTasks > 0) numTasks else sc.defaultParallelism * 4)
    val bc = sc.broadcast((prepared, toOrigLong))
    // Disable global reduction inside tasks — it already ran as dataflow.
    val cfgTask = cfg.copy(globalReduction = false)
    val rootGroups: Seq[Seq[Int]] = (0 until tasks).map(t => (t until n by tasks).toSeq)

    val (count, checksum, metrics) = sc.parallelize(rootGroups, tasks)
      .map { roots =>
        val (prep, toLong) = bc.value
        // The engine already translates labels to compact ids via
        // prep.toOrig; the sink only maps compact id -> original Long id.
        val sink = new LongCountingSink(toLong)
        val m = new Metrics(prep.graph.n)
        Rmce.runRoots(prep, roots, cfgTask, sink, m)
        (sink.count, sink.checksum, m)
      }
      .fold((0L, 0L, new Metrics(n))) { case ((c1, s1, m1), (c2, s2, m2)) =>
        (c1 + c2, s1 + s2, m1.merge(m2))
      }

    metrics.preReportedGlobal += preCliques.size
    metrics.globalDeletedVertices += delV
    metrics.globalDeletedEdges += delE
    val preChecksum = preCliques.iterator.map(cliqueHashLongs).sum
    Result(
      cliqueCount = count + preCliques.size,
      checksum = checksum + preChecksum,
      preReportedGlobal = preCliques.size,
      deletedVertices = delV,
      deletedEdges = delE,
      reducedN = n,
      degeneracy = prepared.degeneracy,
      metrics = metrics)
  }

  /** Driver-only reference run over the same DataFrame (identical ids and
    * hashing), for differential tests against the distributed path.
    */
  def runLocal(spark: SparkSession, edgesDf: DataFrame, cfg: RmceConfig): Result = {
    val pairs = GraphOps.canonicalEdges(edgesDf).select("src", "dst").collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSeq
    val (g, toOrigLong) = CsrGraph.fromLongEdges(pairs)
    val sink = new LongCountingSink(toOrigLong)
    val metrics = new Metrics(g.n)
    Rmce.run(g, cfg, sink, metrics)
    Result(sink.count, sink.checksum, metrics.preReportedGlobal,
      metrics.globalDeletedVertices, metrics.globalDeletedEdges,
      g.n, Degeneracy.degeneracy(g), metrics)
  }

  /** Materialise the clique set as a DataFrame of canonical strings
    * ("a,b,c" with sorted original ids) — for correctness tests on small
    * graphs.
    */
  def cliques(spark: SparkSession, edgesDf: DataFrame, cfg: RmceConfig,
              numTasks: Int = 0): DataFrame = {
    val canon = GraphOps.canonicalEdges(edgesDf)
    val (workEdges, preCliques) =
      if (cfg.globalReduction) {
        val r = DistributedReduction(spark, canon)
        (r.reducedEdges, r.cliques)
      } else (canon, Seq.empty[Array[Long]])

    val pairs = workEdges.select("src", "dst").collect()
      .map(r => (r.getLong(0), r.getLong(1))).toSeq
    val (g, toOrigLong) = CsrGraph.fromLongEdges(pairs)
    val decomp = Degeneracy.decompose(g)
    val prepared = Rmce.Prepared(g.relabelled(decomp.order), decomp.order, decomp.degeneracy)
    val n = prepared.graph.n

    val sc = spark.sparkContext
    val tasks = math.max(1, if (numTasks > 0) numTasks else sc.defaultParallelism)
    val bc = sc.broadcast((prepared, toOrigLong))
    val cfgTask = cfg.copy(globalReduction = false)
    val rootGroups: Seq[Seq[Int]] = (0 until tasks).map(t => (t until n by tasks).toSeq)

    val searched = sc.parallelize(rootGroups, tasks).flatMap { roots =>
      val (prep, toLong) = bc.value
      val out = scala.collection.mutable.ArrayBuffer.empty[String]
      val sink = new CliqueSink {
        // Engine output is already in compact-id space.
        override def report(vertices: Array[Int], len: Int): Unit =
          out += (0 until len).map(i => toLong(vertices(i))).sorted.mkString(",")
      }
      Rmce.runRoots(prep, roots, cfgTask, sink, new Metrics(prep.graph.n))
      out
    }
    val pre = sc.parallelize(preCliques.map(_.sorted.mkString(",")), 1)
    import spark.implicits._
    searched.union(pre).toDF("clique")
  }
}
