package repro.core

/** Reference (k,h)-core decomposition: repeatedly recompute the h-degree of
  * every alive vertex and peel a minimum. Obviously correct and obviously
  * slow — the oracle every production algorithm is tested against.
  */
object NaiveCore {

  def decompose(g: AdjGraph, h: Int): Array[Int] = {
    require(h >= 1, "h must be >= 1")
    val n = g.n
    val alive = Array.fill(n)(true)
    val core = new Array[Int](n)
    val bfs = new HBfs(n)
    val budget = Budget.unlimited()
    var remaining = n
    var k = 0
    while (remaining > 0) {
      var minV = -1
      var minD = Int.MaxValue
      var v = 0
      while (v < n) {
        if (alive(v)) {
          val d = bfs.run(g, alive, v, h, budget)
          if (d < minD) { minD = d; minV = v }
        }
        v += 1
      }
      if (minD > k) k = minD
      core(minV) = k
      alive(minV) = false
      remaining -= 1
    }
    core
  }

  /** h-degree of every vertex of the subgraph induced by `alive`. */
  def hDegrees(g: AdjGraph, alive: Array[Boolean], h: Int): Array[Int] = {
    val bfs = new HBfs(g.n)
    val budget = Budget.unlimited()
    Array.tabulate(g.n)(v => if (alive(v)) bfs.run(g, alive, v, h, budget) else 0)
  }

  /** The (k,h)-core computed from first principles: iteratively delete any
    * vertex with h-degree < k until a fixpoint; the survivors are the core.
    */
  def khCoreVertices(g: AdjGraph, k: Int, h: Int): Array[Int] = {
    val alive = Array.fill(g.n)(true)
    var changed = true
    while (changed) {
      changed = false
      val degs = hDegrees(g, alive, h)
      var v = 0
      while (v < g.n) {
        if (alive(v) && degs(v) < k) { alive(v) = false; changed = true }
        v += 1
      }
    }
    (0 until g.n).filter(alive).toArray
  }
}
