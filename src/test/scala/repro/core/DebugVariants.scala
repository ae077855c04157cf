package repro.core

import repro.gen.Datasets
import repro.harness.BenchRunner

/** Scratch: per-variant timing on selected datasets. */
object DebugVariants {
  def main(args: Array[String]): Unit = {
    val abbrs = if (args.nonEmpty) args.toSeq else Seq("as", "ca", "sp", "sd", "st")
    val k = RecursionKind.Degen
    val cfgs = Seq(
      "base" -> RmceConfig.baseline(k),
      "rmce" -> RmceConfig.rmce(k),
      "noG " -> RmceConfig.variant1(k),
      "noD " -> RmceConfig.variant2(k),
      "noM " -> RmceConfig.variant3(k),
      "onlyG" -> RmceConfig(k, true, false, false),
      "onlyD" -> RmceConfig(k, false, true, false),
      "onlyM" -> RmceConfig(k, false, false, true))
    abbrs.foreach { abbr =>
      val g = Datasets.byAbbr(abbr).csr
      val line = cfgs.map { case (name, cfg) =>
        val s = BenchRunner.timeLocal(abbr, g, cfg, 1, 2)
        f"$name=${s.timeMs}%7.1f(calls=${s.recursiveCalls}%8d)"
      }.mkString(" ")
      println(s"$abbr: $line")
    }
  }
}
