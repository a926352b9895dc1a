package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 3: runtime and h-BFS visits of h-BZ / h-LB / h-LB+UB on the nine
  * larger analogs, h = 2..4. Shape claims reproduced from §6.2:
  *  - h-LB and h-LB+UB beat h-BZ in visit counts by a large factor wherever
  *    h-BZ finishes at all;
  *  - h-LB wins on road networks (sparse, low h-degree everywhere);
  *  - h-BZ hits the budget (NT) on the hard dense instances, like the
  *    paper's 20-hour NTs.
  */
class Table3Bench extends AnyFunSuite {

  test("Table 3: runtime and visits of the three algorithms") {
    val cells = TableRunners.table3()
    val names = Datasets.table3Names

    // the bounded algorithms always finish within budget
    for (name <- names; h <- 2 to 4) {
      assert(cells((name, "h-LB+UB", h)).finished, s"$name h=$h h-LB+UB NT")
    }

    // exactness across algorithms wherever both finished
    for (name <- names; h <- 2 to 4) {
      val done = Seq("h-BZ", "h-LB", "h-LB+UB")
        .map(a => cells((name, a, h))).filter(_.finished).flatMap(_.core)
      for (Seq(a, b) <- done.sliding(2).toSeq if done.size >= 2)
        assert(a.toSeq == b.toSeq, s"$name h=$h: algorithms disagree")
    }

    // visit reduction: wherever h-BZ finished, the bounded algorithms use
    // at least 3x fewer visits (the paper reports >= 10x on its instances;
    // our analogs are smaller, so the factor is smaller but must be large)
    var reductions = List.empty[Double]
    for (name <- names; h <- 2 to 4) {
      val bz = cells((name, "h-BZ", h))
      val lb = cells((name, "h-LB", h))
      if (bz.finished && lb.finished && lb.visits > 0)
        reductions ::= bz.visits.toDouble / lb.visits
    }
    assert(reductions.nonEmpty, "h-BZ finished nowhere — budget too small")
    assert(reductions.max >= 10.0, s"best visit reduction ${reductions.max} < 10x")
    // h-LB never does *more* BFS work than h-BZ, and saves >= 5x on many
    // instances. (The paper words this as "at least one order of magnitude",
    // but its own road-network rows show ~1.4x — road networks are cheap for
    // everyone; we assert what the paper's data actually shows.)
    assert(reductions.forall(_ >= 1.0), s"h-LB should never visit more than h-BZ: $reductions")
    assert(reductions.count(_ >= 5.0) >= 5,
           s"expected several >=5x visit reductions: $reductions")

    // road networks: h-LB at least as good as h-LB+UB (paper §6.2)
    for (name <- Seq("rnPA", "rnTX"); h <- 2 to 4) {
      val lb = cells((name, "h-LB", h))
      val ub = cells((name, "h-LB+UB", h))
      assert(lb.finished, s"$name h=$h h-LB NT")
      assert(lb.visits <= ub.visits * 1.2, s"$name h=$h: h-LB should win on roads")
    }

    // hard dense instances: at h=4 somewhere h-BZ exceeds the budget while
    // h-LB+UB does not (the paper's NT rows)
    val anyNT = names.exists(n => !cells((n, "h-BZ", 4)).finished)
    assert(anyNT, "expected at least one h-BZ NT at h=4 (hard instances)")
  }
}
