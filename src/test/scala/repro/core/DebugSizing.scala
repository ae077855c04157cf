package repro.core

import repro.gen.Datasets
import repro.graph.Degeneracy
import repro.harness.BenchRunner

/** Scratch: sizes and baseline-vs-RMCE times for every stand-in. */
object DebugSizing {
  def main(args: Array[String]): Unit = {
    println(f"${"abbr"}%-4s ${"n"}%8s ${"m"}%9s ${"dmax"}%6s ${"lam"}%4s ${"BKdegen"}%9s ${"RMCEdegen"}%9s ${"cliques"}%9s ${"calls"}%10s")
    Datasets.all.foreach { d =>
      val g = d.csr
      val lam = Degeneracy.degeneracy(g)
      val base = BenchRunner.timeLocal(d.abbr, g, RmceConfig.baseline(RecursionKind.Degen), 1, 1)
      val rmce = BenchRunner.timeLocal(d.abbr, g, RmceConfig.rmce(RecursionKind.Degen), 1, 1)
      require(base.cliques == rmce.cliques && base.checksum == rmce.checksum,
        s"${d.abbr}: result mismatch")
      println(f"${d.abbr}%-4s ${g.n}%8d ${g.m}%9d ${g.maxDegree}%6d $lam%4d ${base.timeMs}%9.1f ${rmce.timeMs}%9.1f ${base.cliques}%9d ${base.recursiveCalls}%10d")
    }
  }
}
