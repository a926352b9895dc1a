package repro.core

/** Algorithm 4 (h-LB+UB) with Algorithm 6 (ImproveLB).
  *
  * The per-vertex upper bound UB (Alg. 5) splits the core-index range into
  * intervals covering `S` contiguous distinct UB values; by Observation 3,
  * all (k,h)-cores with k ≥ i live inside V[i] = {v : UB(v) ≥ i}, so each
  * interval [kmin,kmax] is a totally independent sub-computation on
  * G[V[kmin]], visited **top-down** so the expensive high-core vertices are
  * peeled early and never touched again.
  *
  * Before peeling an interval, [[improveLB]] (Alg. 6) prunes V[kmin] of
  * vertices that provably cannot reach core kmin (power-graph-style
  * cascading decrements) and tightens every survivor's lower bound to LB3
  * via Property 3 (`min h-degree within any V' lower-bounds every core
  * index in V'`).
  */
object HLBUB {

  /** Partition the (descending, distinct) UB values into intervals covering
    * `S` contiguous values each, exactly as Alg. 4 line 11 / Example 4:
    * kmax_i = U(i·S), kmin_i = U(min((i+1)·S, |U|−1)) + 1, where U already
    * has `min LB2 − 1` appended as its last element.
    */
  def intervals(uDesc: Array[Int], s: Int): Seq[(Int, Int)] = {
    require(s >= 1, "partition size S must be >= 1")
    val out = Seq.newBuilder[(Int, Int)]
    var idx = 0
    while (idx < uDesc.length - 1) {
      val nextIdx = math.min(idx + s, uDesc.length - 1)
      out += ((uDesc(nextIdx) + 1, uDesc(idx)))
      idx = nextIdx
    }
    out.result()
  }

  /** Algorithm 6. Mutates `alive` (removing pruned vertices) and `lb3`
    * (monotone max with the Property-3 bound). Returns the surviving
    * vertices' fresh upper-bounded h-degrees only for internal use.
    */
  private def improveLB(g: AdjGraph, h: Int, kmin: Int,
                        alive: Array[Boolean], verts: Array[Int],
                        lb2: Array[Int], lb3: Array[Int],
                        engine: HDegEngine, budget: Budget): Unit = {
    if (verts.isEmpty) return
    val degs = engine.batchHDeg(g, alive, verts, h, budget)
    val deg = new Array[Int](g.n)
    var minDeg = Int.MaxValue
    var i = 0
    while (i < verts.length) {
      deg(verts(i)) = degs(i)
      if (degs(i) < minDeg) minDeg = degs(i)
      i += 1
    }
    // LB3 via Property 3: min h-degree within V[k] bounds every core in it.
    i = 0
    while (i < verts.length) {
      val v = verts(i)
      val cand = math.max(lb2(v), minDeg)
      if (cand > lb3(v)) lb3(v) = cand
      i += 1
    }
    // Cascading clean-up: upper-bounded h-degrees (decrement-by-1) below
    // kmin can never reach core kmin inside this interval.
    val bfs = new HBfs(g.n)
    val queue = new java.util.ArrayDeque[Integer]()
    val queued = new Array[Boolean](g.n)
    i = 0
    while (i < verts.length) {
      val v = verts(i)
      if (deg(v) < kmin) { queue.add(v); queued(v) = true }
      i += 1
    }
    while (!queue.isEmpty) {
      val v: Int = queue.poll()
      if (alive(v)) {
        alive(v) = false
        val cnt = bfs.run(g, alive, v, h, budget)
        var j = 0
        while (j < cnt) {
          val u = bfs.nbrs(j)
          deg(u) -= 1
          if (deg(u) < kmin && !queued(u)) { queue.add(u); queued(u) = true }
          j += 1
        }
      }
    }
  }

  /** Full h-LB+UB decomposition.
    *
    * @param s       interval width in distinct UB values; None ⇒ adaptive
    *                (≈ 12 intervals), the default used by the benches
    * @param useHDegAsUB Table 5 ablation: replace Alg. 5's UB with the
    *                trivial h-degree upper bound
    */
  def decompose(g: AdjGraph, h: Int,
                engine: HDegEngine,
                budget: Budget = Budget.unlimited(),
                s: Option[Int] = None,
                useHDegAsUB: Boolean = false): CoreResult = {
    require(h >= 1, "h must be >= 1")
    val t0 = System.nanoTime()
    val n = g.n
    if (n == 0) return CoreResult(Array.empty, 0, 0, 0)

    val core = Array.fill(n)(-1)
    val assigned = new Array[Boolean](n)
    val lb3 = new Array[Int](n)

    // Lines 3–9: bounds (initial h-degrees are part of UB's computation).
    val l1 = Bounds.lb1(g, h, engine, budget)
    val lb2 = Bounds.lb2(g, h, l1, engine, budget)
    val ub =
      if (useHDegAsUB) Bounds.hDegUB(g, h, engine, budget)
      else Bounds.upperBound(g, h, engine, budget)

    val lb0 = lb2.min
    val uDesc = (ub.distinct :+ (lb0 - 1)).distinct.sortBy(-_)
    val sVal = s.getOrElse(math.max(1, math.ceil((uDesc.length - 1) / 12.0).toInt))
    val parts = intervals(uDesc, sVal)

    val setLB = new Array[Boolean](n)
    val deg = new Array[Int](n)

    for ((kmin, kmax) <- parts) {
      // Line 12: V[kmin] = {v : UB(v) >= kmin} — rebuilt per interval.
      val alive = Array.tabulate(n)(v => ub(v) >= kmin)
      val verts = (0 until n).filter(alive).toArray
      // Lines 13–14: clean + tighten (Alg. 6).
      improveLB(g, h, kmin, alive, verts, lb2, lb3, engine, budget)
      // Lines 15–17: bucket survivors at their best-known floor.
      val buckets = new Buckets(n, math.max(0, n - 1))
      val floor = math.max(0, kmin - 1)
      var v = 0
      while (v < n) {
        if (alive(v)) {
          val b = math.max(math.max(core(v), lb3(v)), floor)
          buckets.add(v, b)
          setLB(v) = true
        }
        v += 1
      }
      // Line 18.
      CoreDecomp.run(g, h, kmin, kmax, alive, buckets, setLB, deg,
                     core, assigned, engine, budget)
    }
    CoreResult(core, budget.visits, budget.bfsCount, (System.nanoTime() - t0) / 1000000L)
  }
}
