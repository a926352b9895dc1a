package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.club._
import repro.apps.{Densest, Landmarks}
import repro.spark.GraphDF

/** One runner per evaluation table. Each returns typed rows (for the bench
  * suites' shape assertions) and emits the rendered table to stdout and
  * `target/bench-results/`. Paper-vs-measured numbers live in
  * EXPERIMENTS.md.
  */
object TableRunners {

  /** Run `body` under a wall-clock budget; Left(NT) on overrun. */
  private def budgeted[T](ms: Long)(body: Budget => T): Either[String, T] = {
    val budget = Budget.withTimeLimit(ms)
    try Right(body(budget))
    catch { case _: BudgetExceeded => Left("NT") }
  }

  private def engineFor(name: String, g: AdjGraph, algo: Algo): HDegEngine =
    // The paper threads only h-LB+UB on the two hardest networks (§6.2).
    if (Datasets.threadedNames(name) && algo.isInstanceOf[Algo.HLBUB])
      new ThreadedEngine(g.n)
    else new SequentialEngine(g.n)

  // ------------------------------------------------------------------ T1

  final case class T1Row(name: String, stats: repro.spark.GraphStats)

  def table1(spark: SparkSession): Seq[T1Row] = {
    val rows = Datasets.all.map(e => T1Row(e.name, GraphDF.stats(spark, Datasets(e.name))))
    Tables.emit("table1", "Table 1: characteristics of dataset analogs",
      Seq("dataset", "|V|", "|E|", "avg deg", "max deg", "diam"),
      rows.map(r => Seq(r.name, r.stats.vertices.toString, r.stats.edges.toString,
                        f"${r.stats.avgDeg}%.2f", r.stats.maxDeg.toString,
                        (if (r.stats.diameterExact) "" else ">=") + r.stats.diameter)))
    rows
  }

  // ------------------------------------------------------------------ T2

  final case class T2Cell(maxCore: Int, distinct: Int)

  def table2(budgetMs: Long = Tables.budgetMs(120000)): Map[(String, Int), T2Cell] = {
    val cells = (for {
      name <- Datasets.table2Names
      h <- 1 to 5
    } yield {
      val g = Datasets(name)
      val eng = new SequentialEngine(g.n)
      val res = budgeted(budgetMs)(b => HLBUB.decompose(g, h, eng, b)).map { r =>
        T2Cell(r.maxCore, r.distinctCores)
      }.getOrElse(T2Cell(-1, -1))
      eng.shutdown()
      (name, h) -> res
    }).toMap
    Tables.emit("table2", "Table 2: maximum core index / number of distinct cores",
      "dataset" +: (1 to 5).map(h => s"h=$h"),
      Datasets.table2Names.map { name =>
        name +: (1 to 5).map { h =>
          val c = cells((name, h))
          if (c.maxCore < 0) "NT" else s"${c.maxCore} / ${c.distinct}"
        }
      })
    cells
  }

  // ------------------------------------------------------------------ T3

  final case class T3Cell(millis: Long, visits: Long, finished: Boolean,
                          core: Option[Array[Int]])

  def table3(budgetMs: Long = Tables.budgetMs(25000),
             names: Seq[String] = Datasets.table3Names): Map[(String, String, Int), T3Cell] = {
    val algos = Seq("h-BZ" -> Algo.HBZ, "h-LB" -> Algo.HLB, "h-LB+UB" -> Algo.HLBUB(None))
    val cells = (for {
      name <- names
      (aName, algo) <- algos
      h <- 2 to 4
    } yield {
      val g = Datasets(name)
      val eng = engineFor(name, g, algo)
      val t0 = System.nanoTime()
      val outcome = budgeted(budgetMs)(b => KHCore.decompose(g, h, algo, Some(eng), b))
      eng.shutdown()
      val ms = (System.nanoTime() - t0) / 1000000L
      val cell = outcome match {
        case Right(r) => T3Cell(r.millis, r.visits, finished = true, Some(r.core))
        case Left(_)  => T3Cell(ms, -1, finished = false, None)
      }
      (name, aName, h) -> cell
    }).toMap
    Tables.emit("table3",
      s"Table 3: runtime (s) and h-BFS visits (x10^6); NT = exceeded ${budgetMs / 1000}s budget",
      Seq("dataset", "algo", "t h=2", "t h=3", "t h=4", "v h=2", "v h=3", "v h=4"),
      for (name <- names; (aName, _) <- algos) yield {
        def cell(h: Int) = cells((name, aName, h))
        Seq(name, aName) ++
          (2 to 4).map(h => if (cell(h).finished) Tables.fmtSecs(cell(h).millis) else "NT") ++
          (2 to 4).map(h => if (cell(h).finished) Tables.fmtVisits(cell(h).visits) else "NT")
      })
    cells
  }

  // ------------------------------------------------------------------ T4

  final case class T4Row(name: String, h: Int,
                         lb1Err: Double, lb1Tight: Double,
                         lb2Err: Double, lb2Tight: Double,
                         hdegErr: Double, hdegTight: Double,
                         ubErr: Double, ubTight: Double)

  /** Mean relative error and tight fraction of a bound vs the true cores
    * (vertices with core 0 are skipped for the relative error, as any
    * nonnegative bound is exact there in relative terms only when 0).
    */
  private def boundQuality(core: Array[Int], bound: Array[Int]): (Double, Double) = {
    val idx = core.indices.filter(core(_) > 0)
    val err = idx.map(v => math.abs(core(v) - bound(v)).toDouble / core(v))
    val tight = core.indices.count(v => core(v) == bound(v)).toDouble / core.length
    (if (err.isEmpty) 0.0 else err.sum / err.size, tight)
  }

  def table4(): Seq[T4Row] = {
    val rows = for {
      name <- Datasets.table45Names
      h <- 2 to 4
    } yield {
      val g = Datasets(name)
      val core = DecompCache.cores(name, h)
      val eng = new SequentialEngine(g.n)
      val (l1, l2) = Bounds.lowerBounds(g, h, eng)
      val hd = Bounds.hDegUB(g, h, eng)
      val ub = Bounds.upperBound(g, h, eng)
      eng.shutdown()
      val (e1, t1) = boundQuality(core, l1)
      val (e2, t2) = boundQuality(core, l2)
      val (eh, th) = boundQuality(core, hd)
      val (eu, tu) = boundQuality(core, ub)
      T4Row(name, h, e1, t1, e2, t2, eh, th, eu, tu)
    }
    Tables.emit("table4", "Table 4: bound quality: relative error / fraction tight",
      Seq("dataset", "h", "LB1", "LB2", "h-degree", "UB"),
      rows.map(r => Seq(r.name, r.h.toString,
        f"${r.lb1Err}%.2f / ${r.lb1Tight * 100}%.1f%%",
        f"${r.lb2Err}%.2f / ${r.lb2Tight * 100}%.1f%%",
        f"${r.hdegErr}%.2f / ${r.hdegTight * 100}%.1f%%",
        f"${r.ubErr}%.2f / ${r.ubTight * 100}%.1f%%")))
    rows
  }

  // ------------------------------------------------------------------ T5

  final case class T5Row(name: String, h: Int, times: Map[String, Option[Long]])

  def table5(budgetMs: Long = Tables.budgetMs(25000)): Seq[T5Row] = {
    val variants = Seq(
      "no LB" -> Algo.HBZ, "LB1" -> Algo.HLB1, "LB2" -> Algo.HLB,
      "h-degree UB" -> Algo.HLBUBHDeg(None), "UB" -> Algo.HLBUB(None))
    val rows = for {
      name <- Datasets.table45Names
      h <- 2 to 4
    } yield {
      val g = Datasets(name)
      val times = variants.map { case (vName, algo) =>
        val eng = new SequentialEngine(g.n)
        val res = budgeted(budgetMs)(b => KHCore.decompose(g, h, algo, Some(eng), b))
        eng.shutdown()
        vName -> res.toOption.map(_.millis)
      }.toMap
      T5Row(name, h, times)
    }
    Tables.emit("table5",
      s"Table 5: effect of bounds on runtime (s); NT = exceeded ${budgetMs / 1000}s budget",
      Seq("dataset", "h") ++ variants.map(_._1),
      rows.map(r => Seq(r.name, r.h.toString) ++
        variants.map { case (vn, _) => r.times(vn).map(Tables.fmtSecs).getOrElse("NT") }))
    rows
  }

  // ------------------------------------------------------------------ T6

  final case class T6Row(name: String, h: Int, clubSize: Option[Int],
                         times: Map[String, Option[Long]])

  def table6(budgetMs: Long = Tables.budgetMs(20000)): Seq[T6Row] = {
    val solvers = Seq("DBC*" -> BnBClubSolver, "ITDBC*" -> (IterativeClubSolver: ClubSolver))
    // JIT warm-up on a small instance so borderline rows don't flip to NT
    // because the hot solver paths compile mid-measurement.
    solvers.foreach(_._2.solve(Datasets("coli"), 2, 0, new ClubBudget()))
    val rows = for {
      name <- Datasets.table6Names
      h <- 2 to 4
    } yield {
      val g = Datasets(name)
      var size: Option[Int] = None
      val entries = scala.collection.mutable.Map.empty[String, Option[Long]]
      for ((sName, solver) <- solvers) {
        // plain solver on the whole graph (the paper's DBC / ITDBC columns)
        val t0 = System.nanoTime()
        val plain =
          try {
            val club = solver.solve(g, h, 0,
              new ClubBudget(deadlineNanos = System.nanoTime() + budgetMs * 1000000L))
            size = size.orElse(Some(club.length)).map(math.max(_, club.length))
            Some((System.nanoTime() - t0) / 1000000L)
          } catch { case _: ClubTimeout => None }
        entries(sName) = plain
        // Algorithm 7 wrapper around the same solver
        val t1 = System.nanoTime()
        val wrapped =
          try {
            val res = CoreClubWrapper.solve(g, h, solver,
              new ClubBudget(deadlineNanos = System.nanoTime() + budgetMs * 1000000L))
            size = size.orElse(Some(res.club.length)).map(math.max(_, res.club.length))
            Some((System.nanoTime() - t1) / 1000000L)
          } catch { case _: ClubTimeout | _: BudgetExceeded => None }
        entries(s"Alg7+$sName") = wrapped
      }
      T6Row(name, h, size, entries.toMap)
    }
    val cols = Seq("DBC*", "ITDBC*", "Alg7+DBC*", "Alg7+ITDBC*")
    Tables.emit("table6",
      s"Table 6: maximum h-club runtime (s); NT = exceeded ${budgetMs / 1000}s budget",
      Seq("dataset", "h", "club size") ++ cols,
      rows.map(r => Seq(r.name, r.h.toString, r.clubSize.map(_.toString).getOrElse("?")) ++
        cols.map(c => r.times(c).map(Tables.fmtSecs).getOrElse("NT"))))
    rows
  }

  // ------------------------------------------------------------------ T7

  final case class T7Result(errors: Map[(String, String), Double],
                            coreInfo: Map[(String, Int), (Int, Int)])

  def table7(l: Int = 20, nPairs: Int = 500, repeats: Int = 10): T7Result = {
    val selNames = (1 to 4).map(h => s"core h=$h") ++ Seq("cc", "bc") ++
      (1 to 4).map(h => s"deg^$h")
    val errors = scala.collection.mutable.Map.empty[(String, String), Double]
    val coreInfo = scala.collection.mutable.Map.empty[(String, Int), (Int, Int)]

    for (name <- Datasets.table7Names) {
      val g = Datasets(name)
      val pairs = Landmarks.samplePairs(g, nPairs, seed = 424242)
      val trueDist = pairs.map { case (s, t) => g.bfsDistances(s)(t) }

      def evalSet(landmarks: Array[Int]): Double = {
        val vecs = landmarks.map(g.bfsDistances)
        val errs = pairs.zip(trueDist).flatMap { case ((s, t), d) =>
          if (d <= 0) None
          else {
            var lb = 0; var ub = Int.MaxValue
            vecs.foreach { vec =>
              val ds = vec(s); val dt = vec(t)
              if (ds >= 0 && dt >= 0) {
                lb = math.max(lb, math.abs(ds - dt)); ub = math.min(ub, ds + dt)
              }
            }
            if (ub == Int.MaxValue) None
            else Some(math.abs((lb + ub) / 2.0 - d) / d)
          }
        }
        if (errs.isEmpty) 0.0 else errs.sum / errs.size
      }

      // (k,h)-core selections: l random vertices from the innermost core,
      // averaged over `repeats` draws.
      for (h <- 1 to 4) {
        val core = DecompCache.cores(name, h)
        val kMax = core.max
        val top = core.indices.filter(core(_) == kMax).toArray
        coreInfo((name, h)) = (kMax, top.length)
        val errs = (1 to repeats).map { rep =>
          val sel = new scala.util.Random(1000 * h + rep)
            .shuffle(top.toSeq).take(math.min(l, top.length)).toArray
          evalSet(sel)
        }
        errors((name, s"core h=$h")) = errs.sum / errs.size
      }
      errors((name, "cc")) = evalSet(Landmarks.topBy(Landmarks.closeness(g), l))
      errors((name, "bc")) = evalSet(Landmarks.topBy(Landmarks.betweenness(g), l))
      for (h <- 1 to 4) {
        val hd = HBfs.allHDegrees(g, h).map(_.toDouble)
        errors((name, s"deg^$h")) = evalSet(Landmarks.topBy(hd, l))
      }
    }

    Tables.emit("table7",
      s"Table 7: landmark selection: mean relative error (l=$l, $nPairs pairs)",
      "selection" +: Datasets.table7Names,
      selNames.map(sel => sel +: Datasets.table7Names.map(n => f"${errors((n, sel))}%.3f")))
    Tables.emit("table7b", "Table 7 (bottom): max core index / size of innermost core",
      "h" +: Datasets.table7Names,
      (1 to 4).map(h => h.toString +: Datasets.table7Names.map { n =>
        val (k, sz) = coreInfo((n, h)); s"$k / $sz"
      }))
    T7Result(errors.toMap, coreInfo.toMap)
  }
}
