package repro.bench

import repro.SparkSpec

/** Table 1: dataset-analog characteristics. Shape checks: each analog sits
  * in the structural regime of its paper counterpart (sparse vs dense,
  * long-diameter roads, heavy hubs).
  */
class Table1Bench extends SparkSpec {

  test("Table 1: characteristics of the 13 dataset analogs") {
    val rows = TableRunners.table1(spark)
    val byName = rows.map(r => r.name -> r.stats).toMap

    // road analogs: tiny max degree, long diameter (paper: rnPA diam 786)
    assert(byName("rnPA").maxDeg <= 6)
    assert(byName("rnPA").diameter >= 40)
    assert(byName("rnTX").diameter >= 40)

    // dense collaboration analogs: avg degree well above the sparse ones
    assert(byName("jazz").avgDeg > 20)   // paper 27.7
    assert(byName("FBco").avgDeg > 15)   // paper 43.7
    assert(byName("caHe").avgDeg > 10)   // paper 19.7

    // sparse analogs (paper: coli 2.78, amzn 3.38, doub 4.22)
    assert(byName("coli").avgDeg < 4)
    assert(byName("amzn").avgDeg < 5)
    assert(byName("doub").avgDeg < 5)

    // hub-dominated social analogs (paper: sytb max deg 25409 vs avg 3.91)
    assert(byName("sytb").maxDeg > 20 * byName("sytb").avgDeg)
    assert(byName("hyves").maxDeg > 20 * byName("hyves").avgDeg)

    // size ordering roughly follows the paper (lj is the largest)
    assert(byName("lj").vertices == rows.map(_.stats.vertices).max)
  }
}
