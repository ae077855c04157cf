package repro.core

import repro.graph.CsrGraph

/** Scratch debug driver: finds the smallest failing random graph for a
  * given config and prints the diff. Run with `Test/runMain repro.core.DebugMain`.
  */
object DebugMain {
  def main(args: Array[String]): Unit = {
    val cfg = RmceConfig(RecursionKind.Degen, false, true, false)
    var found = false
    for (n <- 4 to 13 if !found; seed <- 1 to 200 if !found; p <- Seq(0.3, 0.5, 0.65, 0.8)) {
      val g = TestGraphs.gnp(n, p, seed)
      val expected = BruteForce.maximalCliques(g)
      val sink = new CollectingSink
      Rmce.run(g, cfg, sink)
      if (sink.asSet != expected || sink.cliques.size != sink.asSet.size) {
        found = true
        println(s"FAIL n=$n p=$p seed=$seed")
        println(s"edges: ${g.edges.mkString(" ")}")
        println(s"missing: ${expected -- sink.asSet}")
        println(s"extra:   ${sink.asSet -- expected}")
        println(s"dupes:   ${sink.cliques.groupBy(identity).collect { case (c, l) if l.size > 1 => c }}")
        println(s"reported: ${sink.cliques.sortBy(_.min).mkString(" ")}")
        println(s"expected: ${expected.toSeq.sortBy(_.min).mkString(" ")}")
      }
    }
    if (!found) println("no failure found")
  }
}
