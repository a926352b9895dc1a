package repro.spark

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.AdjGraph

/** Dataset-characteristics row for Table 1. */
final case class GraphStats(vertices: Long, edges: Long,
                            avgDeg: Double, maxDeg: Int, diameter: Int,
                            diameterExact: Boolean)

/** Bridge between the in-memory [[AdjGraph]] substrate and Spark DataFrames,
  * plus the Spark SQL dataset characterization used by Table 1 (checked
  * against DuckDB by the test suite via `repro.Oracle`).
  */
object GraphDF {

  /** Canonical undirected edge list as a DataFrame (src < dst). */
  def edgesDF(spark: SparkSession, g: AdjGraph): DataFrame = {
    import spark.implicits._
    g.edges.toSeq.toDF("src", "dst")
  }

  /** Symmetrized edge list (both directions) — degree queries become a
    * simple group-by on `src`.
    */
  def symmetricEdgesDF(spark: SparkSession, g: AdjGraph): DataFrame = {
    val e = edgesDF(spark, g)
    e.union(e.select(col("dst").as("src"), col("src").as("dst")))
  }

  /** Rebuild an [[AdjGraph]] from a canonical (src,dst) edge DataFrame. */
  def fromEdgesDF(edges: DataFrame, n: Int): AdjGraph = {
    val pairs = edges.select(col("src").cast("int"), col("dst").cast("int"))
      .collect().map(r => (r.getInt(0), r.getInt(1)))
    AdjGraph.fromEdges(n, pairs)
  }

  /** Per-vertex degree via Spark SQL over the symmetrized edge list. */
  def degreesDF(spark: SparkSession, g: AdjGraph): DataFrame =
    symmetricEdgesDF(spark, g)
      .groupBy(col("src").as("vertex"))
      .agg(count(lit(1)).as("degree"))

  /** Table 1 characteristics. Degree stats are computed with Spark SQL;
    * the diameter is exact (all-source BFS) up to `exactDiameterMax`
    * vertices and a double-sweep lower bound (flagged) beyond.
    */
  def stats(spark: SparkSession, g: AdjGraph, exactDiameterMax: Int = 6000): GraphStats = {
    val degs = degreesDF(spark, g)
      .agg(avg("degree").as("avg_deg"), max("degree").as("max_deg"))
      .collect()(0)
    val exact = g.n <= exactDiameterMax
    val diam = if (exact) g.diameterExact() else g.diameterLowerBound()
    // Isolated vertices never appear in the edge list; avg over all n.
    val avgDeg = if (g.n == 0) 0.0 else 2.0 * g.numEdges / g.n
    GraphStats(g.n, g.numEdges, avgDeg,
               if (g.numEdges == 0) 0 else degs.getLong(1).toInt,
               diam, exact)
    // degs.getDouble(0) (Spark's avg over non-isolated) is cross-checked
    // against DuckDB in the test suite.
  }

  /** Per-vertex core-index DataFrame, for SQL-side analyses of a result. */
  def coresDF(spark: SparkSession, core: Array[Int]): DataFrame = {
    import spark.implicits._
    core.zipWithIndex.map { case (c, v) => (v, c) }.toSeq.toDF("vertex", "core")
  }
}
