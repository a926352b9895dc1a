package repro.core

/** Lower and upper bounds on the (k,h)-core index of a vertex (§4.2, §4.4).
  *
  *  - `LB1(v) = deg^{⌊h/2⌋}(v)`                       (Observation 1)
  *  - `LB2(v) = max{LB1(u) : d(u,v) ≤ ⌈h/2⌉} ∪ {LB1(v)}` (Observation 2)
  *  - `UB(v)`  = core index of v in a BZ-style peeling that decrements the
  *    (approximate) h-degree of each h-neighbor of a removed vertex by
  *    exactly 1 — i.e., the classic core decomposition of the *implicit*
  *    power graph, never materialized (Algorithm 5). An upper bound because
  *    a real removal can drop an h-degree by more than 1.
  *  - `hDegUB(v) = deg^h(v)` — the trivial upper bound Table 4/5 compares
  *    UB against.
  */
object Bounds {

  /** LB1 of every vertex: the ⌊h/2⌋-degree (zero when h = 1). */
  def lb1(g: AdjGraph, h: Int, engine: HDegEngine,
          budget: Budget = Budget.unlimited()): Array[Int] = {
    val r = h / 2
    if (r == 0) return new Array[Int](g.n)
    val alive = Array.fill(g.n)(true)
    engine.batchHDeg(g, alive, Array.range(0, g.n), r, budget)
  }

  /** LB2 of every vertex given precomputed LB1 values. */
  def lb2(g: AdjGraph, h: Int, lb1s: Array[Int], engine: HDegEngine,
          budget: Budget = Budget.unlimited()): Array[Int] = {
    val r = (h + 1) / 2
    val alive = Array.fill(g.n)(true)
    engine.batchNbrMax(g, alive, Array.range(0, g.n), r, lb1s, budget)
  }

  /** Both lower bounds in one call. */
  def lowerBounds(g: AdjGraph, h: Int, engine: HDegEngine,
                  budget: Budget = Budget.unlimited()): (Array[Int], Array[Int]) = {
    val l1 = lb1(g, h, engine, budget)
    (l1, lb2(g, h, l1, engine, budget))
  }

  /** Algorithm 5 (UpperBound). Returns per-vertex UB; charges all BFS work
    * (initial h-degrees + one h-BFS per removal to re-discover the current
    * h-neighborhood) to `budget`.
    */
  def upperBound(g: AdjGraph, h: Int, engine: HDegEngine,
                 budget: Budget = Budget.unlimited()): Array[Int] = {
    val n = g.n
    val alive = Array.fill(n)(true)
    val ubdeg = new Array[Int](n)
    val ub = new Array[Int](n)
    val buckets = new Buckets(n, math.max(0, n - 1))
    val bfs = new HBfs(n)

    val init = engine.batchHDeg(g, alive, Array.range(0, n), h, budget)
    var v = 0
    while (v < n) { ubdeg(v) = init(v); buckets.add(v, ubdeg(v)); v += 1 }

    var k = 0
    while (k < n) {
      var w = buckets.pop(k)
      while (w >= 0) {
        ub(w) = k
        val cnt = bfs.run(g, alive, w, h, budget)
        alive(w) = false
        var i = 0
        while (i < cnt) {
          val u = bfs.nbrs(i)
          ubdeg(u) -= 1
          buckets.move(u, math.max(ubdeg(u), k))
          i += 1
        }
        w = buckets.pop(k)
      }
      k += 1
    }
    ub
  }

  /** The trivial upper bound: initial h-degree of every vertex. */
  def hDegUB(g: AdjGraph, h: Int, engine: HDegEngine,
             budget: Budget = Budget.unlimited()): Array[Int] = {
    val alive = Array.fill(g.n)(true)
    engine.batchHDeg(g, alive, Array.range(0, g.n), h, budget)
  }
}
