package repro.bench

import java.nio.file.{Files, Paths, StandardOpenOption}

/** Plain-text table rendering + result persistence shared by the bench
  * suites and the spark-submit jobs. Every runner writes its rendered table
  * to `target/bench-results/<name>.txt` so EXPERIMENTS.md can be diffed
  * against a reproducible artifact.
  */
object Tables {

  def render(title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val all = header +: rows
    val widths = header.indices.map(i => all.map(_(i).length).max)
    def line(r: Seq[String]) =
      r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("| ", " | ", " |")
    val sep = widths.map("-" * _).mkString("|-", "-|-", "-|")
    (Seq(s"== $title ==", line(header), sep) ++ rows.map(line)).mkString("\n")
  }

  def save(name: String, content: String): Unit = {
    // REPRO_RESULTS_DIR (set by build.sbt) pins one directory regardless of
    // whether the caller is a root job or a forked bench-suite JVM.
    val dir = sys.env.get("REPRO_RESULTS_DIR").map(Paths.get(_))
      .getOrElse(Paths.get("target", "bench-results"))
    Files.createDirectories(dir)
    Files.write(dir.resolve(s"$name.txt"), (content + "\n").getBytes("UTF-8"),
                StandardOpenOption.CREATE, StandardOpenOption.TRUNCATE_EXISTING)
  }

  def emit(name: String, title: String, header: Seq[String], rows: Seq[Seq[String]]): String = {
    val s = render(title, header, rows)
    save(name, s)
    println(s)
    s
  }

  def fmtSecs(millis: Long): String = f"${millis / 1000.0}%.2f"
  def fmtVisits(v: Long): String = f"${v / 1e6}%.2f" // ×10^6, vs paper's ×10^8

  /** Bench budgets (milliseconds), overridable via environment. */
  def budgetMs(default: Long): Long =
    sys.env.get("REPRO_BENCH_BUDGET_MS").map(_.toLong).getOrElse(default)
}
