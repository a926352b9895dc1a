package repro.core

/** Algorithm selector for the distance-generalized core decomposition. */
sealed trait Algo
object Algo {
  /** Algorithm 1 — baseline distance-generalized Batagelj–Zaveršnik. */
  case object HBZ extends Algo
  /** Algorithm 2 — lower-bound peeling (LB2). */
  case object HLB extends Algo
  /** Table 5 ablation: h-LB with the weaker LB1 bound. */
  case object HLB1 extends Algo
  /** Algorithm 4 — top-down lower+upper bound peeling. */
  final case class HLBUB(s: Option[Int] = None) extends Algo
  /** Table 5 ablation: h-LB+UB with h-degree as the upper bound. */
  final case class HLBUBHDeg(s: Option[Int] = None) extends Algo
}

/** Facade over the three exact algorithms of §4.
  *
  * All of them return identical core indices (they are exact); they differ
  * in runtime and in the number of h-BFS visits they spend — the quantities
  * Tables 3 and 5 compare.
  */
object KHCore {

  def decompose(g: AdjGraph, h: Int, algo: Algo = Algo.HLBUB(),
                engine: Option[HDegEngine] = None,
                budget: Budget = Budget.unlimited()): CoreResult = {
    val eng = engine.getOrElse(new SequentialEngine(g.n))
    try {
      algo match {
        case Algo.HBZ           => HBZ.decompose(g, h, eng, budget)
        case Algo.HLB           => HLB.decompose(g, h, eng, budget)
        case Algo.HLB1          => HLB.decompose(g, h, eng, budget, useLB1Only = true)
        case Algo.HLBUB(s)      => HLBUB.decompose(g, h, eng, budget, s)
        case Algo.HLBUBHDeg(s)  => HLBUB.decompose(g, h, eng, budget, s, useHDegAsUB = true)
      }
    } finally {
      if (engine.isEmpty) eng.shutdown()
    }
  }

  /** Size of each non-empty (k,h)-core, k = 0 .. max core index. */
  def coreSizes(core: Array[Int]): Array[Int] = {
    if (core.isEmpty) return Array.empty
    val kMax = core.max
    val sizes = new Array[Int](kMax + 1)
    // |C_k| = number of vertices with core index >= k.
    core.foreach { c =>
      var k = 0
      while (k <= c) { sizes(k) += 1; k += 1 }
    }
    sizes
  }

  /** h-degeneracy: the largest k with a non-empty (k,h)-core. */
  def degeneracy(core: Array[Int]): Int = if (core.isEmpty) 0 else core.max
}
