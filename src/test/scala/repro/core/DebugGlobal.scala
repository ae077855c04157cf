package repro.core

import repro.gen.Datasets

/** Scratch: isolate GlobalReduction cost per dataset. */
object DebugGlobal {
  def main(args: Array[String]): Unit = {
    Seq("sd", "as", "sp", "st", "in").foreach { abbr =>
      val g = Datasets.byAbbr(abbr).csr
      // warmup
      GlobalReduction(g, new CountingSink, new Metrics(g.n))
      var best = Double.MaxValue
      var res: GlobalReduction.Result = null
      for (_ <- 1 to 3) {
        val t0 = System.nanoTime()
        res = GlobalReduction(g, new CountingSink, new Metrics(g.n))
        best = math.min(best, (System.nanoTime() - t0) / 1e6)
      }
      println(f"$abbr: globalReduction=${best}%8.1f ms  delV=${res.deletedVertices}%6d delE=${res.deletedEdges}%7d reducedM=${res.reduced.m}%7d")
    }
  }
}
