package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Table 2: max core index / number of distinct cores for h = 1..5.
  * Shape claims reproduced from §6.1:
  *  - the maximum core index grows monotonically with h;
  *  - moving from h=1 to h=2..3 multiplies the number of distinct cores /
  *    the granularity of the analysis;
  *  - for small-diameter networks and large h, vertices collapse into few
  *    cores (distinct count falls while max core keeps growing).
  */
class Table2Bench extends AnyFunSuite {

  test("Table 2: maximum core index / number of distinct cores (h=1..5)") {
    val cells = TableRunners.table2()
    val names = Datasets.table2Names

    for (name <- names; h <- 1 to 5)
      assert(cells((name, h)).maxCore >= 0, s"$name h=$h should finish within budget")

    // max core index is non-decreasing in h (cores only gain members)
    for (name <- names; h <- 1 to 4)
      assert(cells((name, h)).maxCore <= cells((name, h + 1)).maxCore, s"$name h=$h")

    // h=2 max core is much larger than classic (paper: coli 3 -> 72)
    for (name <- names)
      assert(cells((name, 2)).maxCore >= 2 * cells((name, 1)).maxCore,
             s"$name: h=2 should deepen the decomposition")

    // small-diameter dense analogs collapse at large h: distinct cores at
    // h=5 below their h=2..3 peak (paper: cele 52 -> 3, jazz 27 -> 2)
    for (name <- Seq("cele", "jazz", "FBco")) {
      val peak = (2 to 3).map(h => cells((name, h)).distinct).max
      assert(cells((name, 5)).distinct <= peak, s"$name: collapse at h=5")
    }
  }
}
