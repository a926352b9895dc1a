package repro.club

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{AdjGraph, NaiveCore}
import repro.graphgen.GraphGen

/** Max h-club machinery: club checking, exact solvers (against brute force),
  * Theorem 3, and the Algorithm 7 wrapper.
  */
class ClubSpec extends AnyFunSuite {

  /** Brute-force maximum h-club by subset enumeration (n ≤ ~16). */
  private def bruteForceMaxClub(g: AdjGraph, h: Int): Int = {
    require(g.n <= 16)
    var best = 0
    var mask = 1
    while (mask < (1 << g.n)) {
      val size = Integer.bitCount(mask)
      if (size > best) {
        val inSet = Array.tabulate(g.n)(v => (mask & (1 << v)) != 0)
        if (HClub.isHClub(g, inSet, h)) best = size
      }
      mask += 1
    }
    best
  }

  test("isHClub basics: cliques, paths, stars") {
    val k5 = GraphGen.clique(5)
    assert(HClub.isHClub(k5, Array.fill(5)(true), 1))
    val p4 = GraphGen.path(4)
    assert(!HClub.isHClub(p4, Array.fill(4)(true), 2))
    assert(HClub.isHClub(p4, Array.fill(4)(true), 3))
    val s6 = GraphGen.star(6)
    assert(HClub.isHClub(s6, Array.fill(6)(true), 2))
  }

  test("isHClub uses induced distances, not graph distances") {
    // path 0-1-2: {0,2} is a 2-clique but NOT a 2-club (induced: disconnected)
    val g = GraphGen.path(3)
    val inSet = Array(true, false, true)
    assert(!HClub.isHClub(g, inSet, 2))
    assert(g.bfsDistances(0)(2) == 2) // ... even though d_G(0,2)=2
  }

  test("violatingPair returns None exactly on clubs") {
    val g = GraphGen.cycle(6) // diameter 3
    assert(HClub.violatingPair(g, Array.fill(6)(true), 2).isDefined)
    assert(HClub.violatingPair(g, Array.fill(6)(true), 3).isEmpty)
    val (u, w) = HClub.violatingPair(g, Array.fill(6)(true), 2).get
    val d = HClub.inducedDistances(g, Array.fill(6)(true), u)(w)
    assert(d > 2)
  }

  test("dropHeuristic always returns a valid h-club") {
    for (seed <- 1 to 8; h <- 2 to 3) {
      val g = GraphGen.randomConnected(25, 2.5, seed)
      val club = HClub.dropHeuristic(g, h)
      val inSet = Array.fill(g.n)(false)
      club.foreach(inSet(_) = true)
      assert(HClub.isHClub(g, inSet, h), s"seed=$seed h=$h")
      assert(club.nonEmpty)
    }
  }

  for (seed <- 1 to 10; h <- 2 to 3)
    test(s"BnB solver is exact vs brute force (seed $seed, h=$h)") {
      val g = GraphGen.randomConnected(12, 2.2, 50 + seed)
      val expected = bruteForceMaxClub(g, h)
      val got = BnBClubSolver.solve(g, h, 0, new ClubBudget())
      assert(got.length == expected)
      val inSet = Array.fill(g.n)(false); got.foreach(inSet(_) = true)
      assert(HClub.isHClub(g, inSet, h))
    }

  for (seed <- 1 to 10; h <- 2 to 3)
    test(s"Iterative solver is exact vs brute force (seed $seed, h=$h)") {
      val g = GraphGen.randomConnected(12, 2.2, 70 + seed)
      val expected = bruteForceMaxClub(g, h)
      val got = IterativeClubSolver.solve(g, h, 0, new ClubBudget())
      assert(got.length == expected)
    }

  for (seed <- 1 to 5; h <- 2 to 3)
    test(s"solvers agree on a mid-size graph (seed $seed, h=$h)") {
      val g = GraphGen.randomConnected(40, 2.5, 90 + seed)
      val a = BnBClubSolver.solve(g, h, 0, new ClubBudget())
      val b = IterativeClubSolver.solve(g, h, 0, new ClubBudget())
      assert(a.length == b.length)
    }

  test("solver budget raises ClubTimeout") {
    val g = GraphGen.communities(3, 15, 0.3, 0.05, 3)
    intercept[ClubTimeout] {
      BnBClubSolver.solve(g, 2, 0, new ClubBudget(maxNodes = 5))
    }
  }

  for (seed <- 1 to 6; h <- 2 to 3)
    test(s"Theorem 3: every h-club of size k+1 is inside the (k,h)-core (seed $seed, h=$h)") {
      val g = GraphGen.randomConnected(30, 3.0, 110 + seed)
      val core = NaiveCore.decompose(g, h)
      val club = BnBClubSolver.solve(g, h, 0, new ClubBudget())
      val k = club.length - 1
      assert(club.forall(core(_) >= k))
    }

  for (seed <- 1 to 5; h <- 2 to 3;
       solver <- Seq[ClubSolver](BnBClubSolver, IterativeClubSolver))
    test(s"Algorithm 7 wrapper matches the plain solver (seed $seed, h=$h, ${solver.name})") {
      val g = GraphGen.randomConnected(35, 3.0, 130 + seed)
      val plain = BnBClubSolver.solve(g, h, 0, new ClubBudget())
      val wrapped = CoreClubWrapper.solve(g, h, solver)
      assert(wrapped.club.length == plain.length)
      val inSet = Array.fill(g.n)(false); wrapped.club.foreach(inSet(_) = true)
      assert(HClub.isHClub(g, inSet, h))
    }

  test("Algorithm 7 on the Figure-1 graph (h=2)") {
    val g = GraphGen.figure1
    val res = CoreClubWrapper.solve(g, 2, BnBClubSolver)
    val plain = BnBClubSolver.solve(g, 2, 0, new ClubBudget())
    assert(res.club.length == plain.length)
    // Theorem 2 chain: club size <= 1 + degeneracy = 7
    assert(res.club.length <= 7)
  }
}
