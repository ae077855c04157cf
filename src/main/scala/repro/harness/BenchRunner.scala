package repro.harness

import repro.core._
import repro.gen.Datasets
import repro.graph.CsrGraph

/** Timing/metrics harness shared by the bench suites and the spark-submit
  * jobs.
  *
  * The paper's numbers are single-threaded C++ wall-clock; for table shape
  * we therefore time the local kernel directly (one warm-up, median of
  * `reps`). The distributed path is exercised by `DistributedMceBench` /
  * tests, where per-job scheduling overhead would otherwise drown the
  * algorithmic signal on second-scale stand-ins.
  */
object BenchRunner {

  final case class RunStats(
      dataset: String,
      algo: String,
      timeMs: Double,
      cliques: Long,
      checksum: Long,
      recursiveCalls: Long,
      preGlobal: Long,
      preDynamic: Long,
      deletedVertices: Long,
      deletedEdges: Long,
      rootSubproblems: Long,
      forbiddenXTotal: Long,
      forbiddenXKept: Long,
      forbiddenReducedRoots: Long,
      metrics: Metrics)

  /** Time one configuration on one graph (kernel only, driver-local). */
  def timeLocal(dataset: String, g: CsrGraph, cfg: RmceConfig,
                warmups: Int = 1, reps: Int = 3): RunStats = {
    var i = 0
    while (i < warmups) {
      Rmce.run(g, cfg, new CountingSink)
      i += 1
    }
    val times = new Array[Double](reps)
    var last: (CountingSink, Metrics) = null
    i = 0
    while (i < reps) {
      val sink = new CountingSink
      val metrics = new Metrics(g.n)
      val t0 = System.nanoTime()
      Rmce.run(g, cfg, sink, metrics)
      times(i) = (System.nanoTime() - t0) / 1e6
      last = (sink, metrics)
      i += 1
    }
    java.util.Arrays.sort(times)
    val (sink, m) = last
    RunStats(dataset, cfg.label, times(reps / 2), sink.count, sink.checksum,
      m.recursiveCalls, m.preReportedGlobal, m.preReportedDynamic,
      m.globalDeletedVertices, m.globalDeletedEdges,
      m.rootSubproblems, m.forbiddenXTotal, m.forbiddenXKept, m.forbiddenReducedRoots, m)
  }

  def dataset(abbr: String): CsrGraph = Datasets.byAbbr(abbr).csr

  /** Fixed-width table printer (monospace logs). */
  def formatTable(header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(c => all.map(_(c).length).max)
    def line(r: Seq[String]): String =
      r.zip(widths).map { case (cell, w) => cell.padTo(w, ' ') }.mkString("  ")
    (line(header) +: line(widths.map("-" * _)) +: rows.map(line)).mkString("\n")
  }

  def f1(x: Double): String = f"$x%.1f"
  def f2(x: Double): String = f"$x%.2f"
  def f3(x: Double): String = f"$x%.3f"
  def pct(x: Double): String = f"${100 * x}%.1f%%"
}
