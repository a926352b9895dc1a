package repro.spark

import org.apache.spark.sql.SparkSession
import repro.core.{AdjGraph, Budget, HBfs, HDegEngine, SequentialEngine}

/** [[HDegEngine]] that distributes batch h-degree computations over Spark
  * executors — the cluster-scale version of the §4.6 parallelization
  * ("give different h-BFS traversals to different processors").
  *
  * The CSR adjacency is broadcast once per engine instance; the (mutable)
  * alive mask is shipped per batch. Only large batches go through Spark —
  * single-vertex updates during peeling stay local, where they belong.
  */
final class SparkEngine(spark: SparkSession, g: AdjGraph,
                        minDistributedBatch: Int = 512) extends HDegEngine {
  private val sc = spark.sparkContext
  private val adjBc = sc.broadcast(g.adj)
  private val n = g.n
  private val local = new SequentialEngine(n)

  override def batchHDeg(g2: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                         h: Int, budget: Budget): Array[Int] = {
    require(g2.n == n, "SparkEngine is bound to the graph it was built for")
    if (vertices.length < minDistributedBatch)
      return local.batchHDeg(g2, alive, vertices, h, budget)
    val aliveBc = sc.broadcast(alive)
    val adjB = adjBc
    val nLocal = n
    try {
      val rows = sc.parallelize(vertices.zipWithIndex.toSeq, sc.defaultParallelism)
        .mapPartitions { it =>
          val graph = new AdjGraph(nLocal, adjB.value)
          val bfs = new HBfs(nLocal)
          val b = Budget.unlimited() // per-task accounting, merged below
          val out = it.map { case (v, i) => (i, bfs.run(graph, aliveBc.value, v, h, b)) }.toArray
          Iterator((out, b.visits, b.bfsCount))
        }
        .collect()
      val degs = new Array[Int](vertices.length)
      rows.foreach { case (part, visits, bfsCount) =>
        part.foreach { case (i, d) => degs(i) = d }
        budget.merge(visits, bfsCount)
      }
      budget.check()
      degs
    } finally aliveBc.destroy()
  }

  override def batchNbrMax(g2: AdjGraph, alive: Array[Boolean], vertices: Array[Int],
                           r: Int, value: Array[Int], budget: Budget): Array[Int] =
    // LB2 batches are one-shot and cheap relative to peeling; keep local.
    local.batchNbrMax(g2, alive, vertices, r, value, budget)

  override def shutdown(): Unit = adjBc.destroy()
}
