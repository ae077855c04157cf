package repro.core

/** Which Bron–Kerbosch recursion the framework wraps (Alg. 4's `recursive`
  * can be any BK-based algorithm; these are the four the paper evaluates).
  */
sealed trait RecursionKind extends Serializable { def name: String }
object RecursionKind {
  /** Degeneracy order + Tomita max-|N(u)∩P| pivot (Eppstein et al.). */
  case object Degen extends RecursionKind { val name = "degen" }
  /** Top-down: peel the sparsest candidate until P is a clique (Li et al.). */
  case object Rcd extends RecursionKind { val name = "rcd" }
  /** Hybrid adjacency list + partial adjacency matrix per root (Jin et al.). */
  case object Facen extends RecursionKind { val name = "facen" }
  /** Refined pivot selection with X-dominance pruning (Naudé). */
  case object Revised extends RecursionKind { val name = "revised" }

  val all: Seq[RecursionKind] = Seq(Degen, Rcd, Facen, Revised)
}

/** One enumeration configuration: a recursion plus any subset of the three
  * reduction techniques. The paper's named algorithms are fixed points in
  * this space.
  */
final case class RmceConfig(
    recursion: RecursionKind,
    globalReduction: Boolean,
    dynamicReduction: Boolean,
    maximalityReduction: Boolean) extends Serializable {

  def label: String =
    if (!globalReduction && !dynamicReduction && !maximalityReduction) s"BK${recursion.name}"
    else {
      val off = Seq(
        if (globalReduction) "" else "-g",
        if (dynamicReduction) "" else "-d",
        if (maximalityReduction) "" else "-m").mkString
      s"RMCE${recursion.name}$off"
    }
}

object RmceConfig {
  /** Baseline: plain recursion, no reductions. */
  def baseline(k: RecursionKind): RmceConfig = RmceConfig(k, false, false, false)
  /** Full RMCE: all three reductions on. */
  def rmce(k: RecursionKind): RmceConfig = RmceConfig(k, true, true, true)
  /** Ablation Variant1: global reduction disabled. */
  def variant1(k: RecursionKind): RmceConfig = RmceConfig(k, false, true, true)
  /** Ablation Variant2: dynamic reduction disabled. */
  def variant2(k: RecursionKind): RmceConfig = RmceConfig(k, true, false, true)
  /** Ablation Variant3: maximality check reduction disabled. */
  def variant3(k: RecursionKind): RmceConfig = RmceConfig(k, true, true, false)
}
