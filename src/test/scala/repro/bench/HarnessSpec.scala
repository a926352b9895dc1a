package repro.bench

import org.scalatest.funsuite.AnyFunSuite

/** Bench-harness plumbing: datasets registry, table rendering, budgets. */
class HarnessSpec extends AnyFunSuite {

  test("all dataset analogs build and are cached") {
    for (e <- Datasets.all) {
      val g1 = Datasets(e.name)
      val g2 = Datasets(e.name)
      assert(g1 eq g2, s"${e.name} not cached")
      assert(g1.n > 0 && g1.numEdges > 0)
    }
  }

  test("unknown dataset name is rejected") {
    intercept[NoSuchElementException] { Datasets("nope") }
  }

  test("table name lists reference registered datasets only") {
    val known = Datasets.all.map(_.name).toSet
    (Datasets.table2Names ++ Datasets.table3Names ++ Datasets.table45Names ++
     Datasets.table6Names ++ Datasets.table7Names).foreach(n => assert(known(n), n))
  }

  test("dataset analogs are deterministic across builds") {
    val e = Datasets.all.find(_.name == "coli").get
    assert(e.build().edges.toSeq == e.build().edges.toSeq)
  }

  test("render aligns columns and includes all rows") {
    val s = Tables.render("T", Seq("a", "bb"), Seq(Seq("1", "2"), Seq("333", "4")))
    val lines = s.split("\n")
    assert(lines.length == 5)
    assert(lines.drop(1).map(_.length).distinct.length == 1) // aligned
    assert(s.contains("333"))
  }

  test("save writes under target/bench-results") {
    Tables.save("harness-spec-probe", "hello")
    val p = java.nio.file.Paths.get("target", "bench-results", "harness-spec-probe.txt")
    assert(java.nio.file.Files.readString(p).trim == "hello")
  }

  test("fmt helpers") {
    assert(Tables.fmtSecs(1234) == "1.23")
    assert(Tables.fmtVisits(2_500_000) == "2.50")
  }

  test("budgetMs falls back to the default without the env override") {
    if (!sys.env.contains("REPRO_BENCH_BUDGET_MS"))
      assert(Tables.budgetMs(123) == 123)
  }

  test("DecompCache returns consistent cores and caches them") {
    val c1 = DecompCache.cores("coli", 2)
    val c2 = DecompCache.cores("coli", 2)
    assert(c1 eq c2)
    val g = Datasets("coli")
    assert(c1.toSeq == repro.core.NaiveCore.decompose(g, 2).toSeq)
  }
}
