package repro.club

import repro.core.AdjGraph

/** Budget/outcome types for the NP-hard maximum h-club solvers. */
final class ClubBudget(val maxNodes: Long = Long.MaxValue,
                       val deadlineNanos: Long = Long.MaxValue) {
  var nodes: Long = 0
  def tick(): Unit = {
    nodes += 1
    if (nodes > maxNodes) throw new ClubTimeout
    checkTime()
  }
  /** Deadline-only check, cheap enough for per-BFS granularity. */
  def checkTime(): Unit =
    if (deadlineNanos != Long.MaxValue && System.nanoTime() > deadlineNanos)
      throw new ClubTimeout
}
final class ClubTimeout extends RuntimeException("club solver budget exceeded")

/** A maximum h-club solver: the "black-box algorithm A(G,h)" of Alg. 7. */
trait ClubSolver {
  /** Maximum h-club of g (vertex ids of g), given a known feasible lower
    * bound `incumbentSize` (only clubs strictly larger are searched for;
    * if none exists the returned set may be empty).
    */
  def solve(g: AdjGraph, h: Int, incumbentSize: Int, budget: ClubBudget): Array[Int]
  def name: String
}

/** Exact combinatorial branch-and-bound — our substitute for the paper's
  * Gurobi-based DBC baseline [45] (see DESIGN.md §3). Classic h-club B&B:
  * start from S = V; if the induced diameter is ≤ h we have a club; else
  * pick a violating pair (u,w) — no h-club inside S contains both — and
  * branch on S∖{u} and S∖{w}. Prune when |S| can no longer beat the
  * incumbent. The DROP heuristic seeds the incumbent.
  */
object BnBClubSolver extends ClubSolver {
  override val name = "DBC*"

  override def solve(g: AdjGraph, h: Int, incumbentSize: Int, budget: ClubBudget): Array[Int] = {
    var best: Array[Int] = Array.empty
    var bestSize = incumbentSize
    val drop = HClub.dropHeuristic(g, h, onStep = budget.checkTime)
    if (drop.length > bestSize) { best = drop; bestSize = drop.length }

    // Cascading bound prune: a member of a club of size > bestSize must
    // reach ≥ bestSize others within induced distance h of the *current*
    // candidate set (distances only shrink in supersets), so anything below
    // that reach can be deleted. Returns the surviving size, or -1 when the
    // node can no longer beat the incumbent.
    def prune(inSet: Array[Boolean], size0: Int): Int = {
      var size = size0
      var changed = true
      while (changed) {
        changed = false
        if (size <= bestSize) return -1
        var v = 0
        while (v < g.n) {
          if (inSet(v)) {
            budget.checkTime()
            if (HClub.reachableWithin(g, inSet, v, h) < bestSize) {
              inSet(v) = false; size -= 1; changed = true
            }
          }
          v += 1
        }
      }
      if (size <= bestSize) -1 else size
    }

    // Connected components of the candidate set: a club's induced subgraph
    // has diameter <= h, so it is connected and lives inside one component.
    // Splitting prunes whole components below the incumbent and lets sparse
    // instances (roads) splinter into trivial pieces.
    def components(inSet: Array[Boolean]): List[Array[Int]] = {
      val seen = new Array[Boolean](g.n)
      var out = List.empty[Array[Int]]
      var s = 0
      while (s < g.n) {
        if (inSet(s) && !seen(s)) {
          val buf = Array.newBuilder[Int]
          val q = new java.util.ArrayDeque[Integer]()
          q.add(s); seen(s) = true
          while (!q.isEmpty) {
            val u: Int = q.poll()
            buf += u
            g.adj(u).foreach(w => if (inSet(w) && !seen(w)) { seen(w) = true; q.add(w) })
          }
          out ::= buf.result()
        }
        s += 1
      }
      out
    }

    def rec(inSet: Array[Boolean], size0: Int): Unit = {
      budget.tick()
      val size = prune(inSet, size0)
      if (size < 0) return
      val comps = components(inSet)
      if (comps.length > 1) {
        for (c <- comps.sortBy(-_.length) if c.length > bestSize) {
          val mask = new Array[Boolean](g.n)
          c.foreach(mask(_) = true)
          rec(mask, c.length)
        }
        return
      }
      HClub.violatingPair(g, inSet, h) match {
        case None =>
          best = (0 until g.n).filter(inSet).toArray
          bestSize = size
        case Some((u, w)) =>
          val left = inSet.clone(); left(u) = false
          rec(left, size - 1)
          val right = inSet.clone(); right(w) = false
          rec(right, size - 1)
      }
    }

    if (g.n > bestSize) rec(Array.fill(g.n)(true), g.n)
    best
  }
}

/** Exact iterative solver — our substitute for the paper's ITDBC [45]: any
  * h-club containing v lies inside {v} ∪ N_G(v,h) (induced distances are
  * never shorter than graph distances), so iterate vertices and solve the
  * branch-and-bound restricted to that neighborhood, then discard v. The
  * per-iteration instances are much smaller than the whole graph.
  */
object IterativeClubSolver extends ClubSolver {
  override val name = "ITDBC*"

  override def solve(g: AdjGraph, h: Int, incumbentSize: Int, budget: ClubBudget): Array[Int] = {
    var best: Array[Int] = Array.empty
    var bestSize = incumbentSize
    val alive = Array.fill(g.n)(true)
    // process high-h-degree vertices first: they anchor the largest clubs,
    // raising the incumbent early
    val hdegs = repro.core.HBfs.allHDegrees(g, h)
    val order = (0 until g.n).sortBy(v => -hdegs(v))
    for (v <- order if alive(v)) {
      budget.tick()
      if (hdegs(v) + 1 > bestSize) {
        val ball = repro.core.HBfs.hNeighborhood(g, alive, v, h) :+ v
        if (ball.length > bestSize) {
          val (sub, ids) = g.inducedOn(ball.toSeq)
          val found = BnBClubSolver.solve(sub, h, bestSize, budget)
          if (found.length > bestSize) {
            best = found.map(ids)
            bestSize = found.length
          }
        }
      }
      alive(v) = false
    }
    best
  }
}
