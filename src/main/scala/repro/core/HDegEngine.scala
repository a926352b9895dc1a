package repro.core

import java.util.concurrent.{Callable, Executors, TimeUnit}
import scala.jdk.CollectionConverters._

/** Batch computation of h-degrees for a set of vertices over a fixed alive
  * mask — the block the paper parallelizes in §4.6 (its preferred option:
  * "give different h-BFS traversals to different processors").
  *
  * Engines must be pure w.r.t. the graph state: each listed vertex gets an
  * independent h-BFS, so batches can be computed in any order / in parallel.
  */
trait HDegEngine {
  /** h-degree of each vertex in `vertices` (aligned), charged to `budget`. */
  def batchHDeg(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                h: Int, budget: Budget): Array[Int]

  /** For each vertex v in `vertices`: max of `value` over v's r-neighborhood
    * including v itself — the kernel of the LB2 bound (Obs. 2). */
  def batchNbrMax(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                  r: Int, value: Array[Int], budget: Budget): Array[Int]

  /** Release any pooled resources (thread pools). */
  def shutdown(): Unit = ()
}

private object EngineKernels {
  /** Sequential kernel shared by the engines: max of `value` over the
    * r-neighborhood of each vertex (including the vertex). */
  def nbrMaxRange(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                  r: Int, value: Array[Int], budget: Budget,
                  bfs: HBfs, out: Array[Int], from: Int, until: Int): Unit = {
    var i = from
    while (i < until) {
      val v = vertices(i)
      var best = value(v)
      if (r >= 1) {
        val cnt = bfs.run(g, alive, v, r, budget)
        var j = 0
        while (j < cnt) {
          val x = value(bfs.nbrs(j))
          if (x > best) best = x
          j += 1
        }
      }
      out(i) = best
      i += 1
    }
  }
}

/** Single-threaded engine (the sequential versions of the algorithms). */
final class SequentialEngine(n: Int) extends HDegEngine {
  private val bfs = new HBfs(n)

  override def batchHDeg(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                         h: Int, budget: Budget): Array[Int] = {
    val out = new Array[Int](vertices.length)
    var i = 0
    while (i < vertices.length) {
      out(i) = bfs.run(g, alive, vertices(i), h, budget)
      i += 1
    }
    out
  }

  override def batchNbrMax(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                           r: Int, value: Array[Int], budget: Budget): Array[Int] = {
    val out = new Array[Int](vertices.length)
    EngineKernels.nbrMaxRange(g, alive, vertices, r, value, budget, bfs, out, 0, vertices.length)
    out
  }
}

/** Multithreaded engine (§4.6): a fixed pool; each task owns a thread-local
  * [[HBfs]] scratchpad and takes a contiguous chunk of the vertex batch.
  * Falls back to sequential for small batches where fork-join overhead
  * dominates.
  */
final class ThreadedEngine(n: Int, threads: Int = Runtime.getRuntime.availableProcessors())
    extends HDegEngine {
  private val pool = Executors.newFixedThreadPool(threads)
  private val localBfs = ThreadLocal.withInitial[HBfs](() => new HBfs(n))
  private val seqFallback = new SequentialEngine(n)
  private val minParallelBatch = 32

  override def batchHDeg(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                         h: Int, budget: Budget): Array[Int] = {
    if (vertices.length < minParallelBatch)
      return seqFallback.batchHDeg(g, alive, vertices, h, budget)
    val out = new Array[Int](vertices.length)
    val chunk = math.max(16, vertices.length / (threads * 4))
    val tasks = (0 until vertices.length by chunk).map { start =>
      val end = math.min(vertices.length, start + chunk)
      new Callable[Unit] {
        override def call(): Unit = {
          val bfs = localBfs.get()
          var i = start
          while (i < end) {
            out(i) = bfs.run(g, alive, vertices(i), h, budget)
            i += 1
          }
        }
      }
    }
    val futures = pool.invokeAll(tasks.asJava)
    futures.asScala.foreach(_.get()) // rethrow BudgetExceeded etc.
    out
  }

  override def batchNbrMax(g: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                           r: Int, value: Array[Int], budget: Budget): Array[Int] = {
    if (vertices.length < minParallelBatch)
      return seqFallback.batchNbrMax(g, alive, vertices, r, value, budget)
    val out = new Array[Int](vertices.length)
    val chunk = math.max(16, vertices.length / (threads * 4))
    val tasks = (0 until vertices.length by chunk).map { start =>
      val end = math.min(vertices.length, start + chunk)
      new Callable[Unit] {
        override def call(): Unit =
          EngineKernels.nbrMaxRange(g, alive, vertices, r, value, budget,
                                    localBfs.get(), out, start, end)
      }
    }
    pool.invokeAll(tasks.asJava).asScala.foreach(_.get())
    out
  }

  override def shutdown(): Unit = {
    pool.shutdown()
    pool.awaitTermination(10, TimeUnit.SECONDS)
    ()
  }
}
