package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 6: maximum h-club — plain exact solvers vs the Algorithm-7 core
  * wrapper. Shape claims reproduced from §6.5:
  *  - the wrapper solves instances where the plain whole-graph solver hits
  *    the budget (paper: DBC runs out of memory / time on large graphs);
  *  - where both finish, the wrapper is no slower overall (it solves a much
  *    smaller instance).
  */
class Table6Bench extends AnyFunSuite {

  test("Table 6: maximum h-club runtimes, plain vs Algorithm 7") {
    val rows = TableRunners.table6()

    // wherever a plain solver finished, its Algorithm-7 wrapper also
    // finishes, and within 2x + decomposition overhead (paper: much faster
    // on its large instances; ours are small enough that parity happens)
    for (r <- rows; m <- Seq("DBC*", "ITDBC*"); plain <- r.times(m)) {
      val wrapped = r.times(s"Alg7+$m")
      assert(wrapped.isDefined, s"${r.name} h=${r.h} Alg7+$m NT while $m finished")
      assert(wrapped.get <= plain * 2 + 1000,
             s"${r.name} h=${r.h}: Alg7+$m ${wrapped.get}ms vs plain ${plain}ms")
    }

    // the wrapper yields a dramatic speed-up somewhere (paper amzn h=2:
    // OM for DBC vs 2.5s wrapped; our amzn: ~19s vs ~0.01s)
    val speedups = for {
      r <- rows
      plain <- r.times("DBC*").toSeq
      wrapped <- r.times("Alg7+DBC*").toSeq if wrapped > 0
    } yield plain.toDouble / wrapped
    assert(rows.exists(r => r.times("DBC*").isEmpty) || speedups.exists(_ >= 10.0),
           s"expected DBC* NT rows or a >=10x wrapper speed-up: $speedups")

    // ITDBC* (the stronger baseline, like the paper's ITDBC) solves the
    // sparse road/co-purchase instances the whole-graph DBC* cannot
    for (r <- rows if r.name.startsWith("rn") || r.name == "amzn")
      assert(r.times("ITDBC*").isDefined || r.times("Alg7+ITDBC*").isDefined,
             s"${r.name} h=${r.h}: no exact method finished")

    // a club size was established on every row where any method finished
    for (r <- rows if r.times.values.exists(_.isDefined))
      assert(r.clubSize.exists(_ >= 1), s"${r.name} h=${r.h}")

    // road-network clubs are tiny (paper rnPA/rnTX: 5..29); the dense
    // social analog carries a large club (paper FBco: >= 1000)
    for (r <- rows if r.name.startsWith("rn"); s <- r.clubSize)
      assert(s <= 60, s"${r.name} h=${r.h} club $s")
    for (r <- rows if r.name == "FBco" && r.h == 4; s <- r.clubSize)
      assert(s >= 100, s"FBco h=4 club $s")
  }
}
