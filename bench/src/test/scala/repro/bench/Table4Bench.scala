package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 4: quality of the lower bounds (LB1 vs LB2) and upper bounds
  * (h-degree vs UB). Shape claims reproduced from §6.3:
  *  - LB2 has smaller relative error and a larger tight fraction than LB1;
  *  - UB is far more accurate than the baseline h-degree, "often very close
  *    to the actual value of the core index".
  */
class Table4Bench extends AnyFunSuite {

  test("Table 4: bound quality — relative error and tight fraction") {
    val rows = TableRunners.table4()
    assert(rows.size == Datasets.table45Names.size * 3)

    for (r <- rows) {
      val tag = s"${r.name} h=${r.h}"
      // LB2 refines LB1
      assert(r.lb2Err <= r.lb1Err + 1e-12, s"$tag: LB2 error worse than LB1")
      assert(r.lb2Tight >= r.lb1Tight - 1e-12, s"$tag: LB2 tight fraction below LB1")
      // UB crushes the h-degree baseline
      assert(r.ubErr <= r.hdegErr + 1e-12, s"$tag: UB error worse than h-degree")
      assert(r.ubTight >= r.hdegTight - 1e-12, s"$tag: UB tight fraction below h-degree")
      // UB is near-exact (paper: 0.01-0.05 relative error)
      assert(r.ubErr <= 0.25, s"$tag: UB error ${r.ubErr} unexpectedly large")
      // sanity ranges
      Seq(r.lb1Err, r.lb2Err, r.hdegErr, r.ubErr).foreach(e => assert(e >= 0))
      Seq(r.lb1Tight, r.lb2Tight, r.hdegTight, r.ubTight)
        .foreach(t => assert(t >= 0 && t <= 1))
    }

    // on the sparse analogs the LB2 jump is dramatic (paper amzn h=2:
    // LB1 0.69/2.1% vs LB2 0.09/56.5%)
    val amzn2 = rows.find(r => r.name == "amzn" && r.h == 2).get
    assert(amzn2.lb2Err < amzn2.lb1Err / 2)
    assert(amzn2.lb2Tight > 5 * math.max(amzn2.lb1Tight, 0.01))
  }
}
