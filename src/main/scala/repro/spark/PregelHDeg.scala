package repro.spark

import org.apache.spark.graphx.{Edge, EdgeTriplet, Graph, Pregel, VertexId, EdgeDirection}
import org.apache.spark.sql.SparkSession
import repro.core.AdjGraph

/** Vertex-centric (GraphX Pregel) computation of h-degrees.
  *
  * Each vertex keeps the set of vertices it has seen plus the frontier
  * discovered in the previous superstep; for `h` supersteps, frontiers are
  * flooded to neighbors and newly-seen ids become the next frontier. After
  * round `h`, `|seen| - 1` is exactly `deg^h(v)`, because BFS layers in an
  * unweighted graph coincide with flooding rounds.
  *
  * This is the distributed analogue of the initial h-degree block the paper
  * parallelizes (§4.6), and it also yields LB1 (radius ⌊h/2⌋) in the same
  * framework by just running fewer rounds.
  */
object PregelHDeg {

  /** GraphX graph from the substrate graph (vertex ids 0..n-1). */
  def toGraphX(spark: SparkSession, g: AdjGraph): Graph[Unit, Unit] = {
    val sc = spark.sparkContext
    val vertices = sc.parallelize((0L until g.n.toLong).map(v => (v, ())))
    val edges = sc.parallelize(g.edges.toSeq.flatMap { case (a, b) =>
      // symmetrize: GraphX edges are directed
      Seq(Edge(a.toLong, b.toLong, ()), Edge(b.toLong, a.toLong, ()))
    })
    Graph(vertices, edges)
  }

  /** h-degree of every vertex of g via Pregel flooding. */
  def hDegrees(spark: SparkSession, g: AdjGraph, h: Int): Array[Int] = {
    require(h >= 1)
    if (g.n == 0) return Array.empty
    val gx = toGraphX(spark, g)

    // attr = (seen, frontier); initial message seeds the self-id.
    type Attr = (Set[VertexId], Set[VertexId])
    val init: Graph[Attr, Unit] = gx.mapVertices((id, _) => (Set(id), Set(id)))

    def vprog(id: VertexId, attr: Attr, msg: Set[VertexId]): Attr = {
      // The empty initial message must not clobber the seeded frontier;
      // real flooding messages are never empty (mergeMsg unions non-empty).
      if (msg.isEmpty) attr
      else {
        val fresh = msg -- attr._1
        (attr._1 ++ fresh, fresh)
      }
    }
    def sendMsg(t: EdgeTriplet[Attr, Unit]): Iterator[(VertexId, Set[VertexId])] =
      if (t.srcAttr._2.nonEmpty) Iterator((t.dstId, t.srcAttr._2)) else Iterator.empty
    def merge(a: Set[VertexId], b: Set[VertexId]): Set[VertexId] = a ++ b

    val res = Pregel(init, initialMsg = Set.empty[VertexId],
                     maxIterations = h, activeDirection = EdgeDirection.Out)(
      vprog, sendMsg, merge)

    val out = new Array[Int](g.n)
    res.vertices.collect().foreach { case (id, (seen, _)) =>
      out(id.toInt) = seen.size - 1
    }
    out
  }
}
