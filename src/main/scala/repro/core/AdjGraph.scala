package repro.core

import scala.collection.mutable

/** Compact undirected, unweighted graph over vertices `0 until n`.
  *
  * Adjacency is stored as one sorted `Array[Int]` per vertex (a CSR-style
  * layout that keeps the hot h-BFS loops allocation-free). Self-loops and
  * parallel edges are dropped at construction.
  *
  * @param n   number of vertices
  * @param adj per-vertex sorted neighbor arrays
  */
final class AdjGraph(val n: Int, val adj: Array[Array[Int]]) extends Serializable {

  /** Degree of vertex `v` in the full graph. */
  def degree(v: Int): Int = adj(v).length

  /** Number of undirected edges. */
  val numEdges: Long = adj.map(_.length.toLong).sum / 2

  /** Undirected edge list with `src < dst`, sorted. */
  def edges: Array[(Int, Int)] = {
    val b = Array.newBuilder[(Int, Int)]
    var v = 0
    while (v < n) {
      adj(v).foreach(u => if (v < u) b += ((v, u)))
      v += 1
    }
    b.result()
  }

  /** BFS distances from `src` over the whole graph; -1 = unreachable. */
  def bfsDistances(src: Int): Array[Int] = {
    val dist = Array.fill(n)(-1)
    val q = new Array[Int](n)
    var head = 0; var tail = 0
    dist(src) = 0; q(tail) = src; tail += 1
    while (head < tail) {
      val u = q(head); head += 1
      val a = adj(u); var i = 0
      while (i < a.length) {
        val w = a(i)
        if (dist(w) < 0) { dist(w) = dist(u) + 1; q(tail) = w; tail += 1 }
        i += 1
      }
    }
    dist
  }

  /** Connected components: vertex -> component id (0-based, by discovery). */
  def components(): Array[Int] = {
    val comp = Array.fill(n)(-1)
    val q = new Array[Int](n)
    var c = 0
    var s = 0
    while (s < n) {
      if (comp(s) < 0) {
        var head = 0; var tail = 0
        comp(s) = c; q(tail) = s; tail += 1
        while (head < tail) {
          val u = q(head); head += 1
          val a = adj(u); var i = 0
          while (i < a.length) {
            val w = a(i)
            if (comp(w) < 0) { comp(w) = c; q(tail) = w; tail += 1 }
            i += 1
          }
        }
        c += 1
      }
      s += 1
    }
    comp
  }

  /** Exact diameter of the (assumed connected) graph via all-source BFS.
    * Returns the max eccentricity over vertices reachable from 0; for a
    * disconnected graph this is the diameter of vertex 0's component.
    */
  def diameterExact(): Int = {
    var d = 0
    var v = 0
    while (v < n) {
      val dist = bfsDistances(v)
      var i = 0
      while (i < n) { if (dist(i) > d) d = dist(i); i += 1 }
      v += 1
    }
    d
  }

  /** Double-sweep lower bound on the diameter (cheap, for large graphs). */
  def diameterLowerBound(sweeps: Int = 4): Int = {
    var best = 0
    var src = 0
    var s = 0
    while (s < sweeps) {
      val dist = bfsDistances(src)
      var far = src; var fd = 0
      var i = 0
      while (i < n) { if (dist(i) > fd) { fd = dist(i); far = i }; i += 1 }
      if (fd > best) best = fd
      src = far
      s += 1
    }
    best
  }

  /** Induced subgraph on `keep` (a boolean mask), with vertices relabeled
    * densely. Returns the subgraph plus the old-id of each new vertex.
    */
  def induced(keep: Array[Boolean]): (AdjGraph, Array[Int]) = {
    val old2new = Array.fill(n)(-1)
    val newIds = Array.newBuilder[Int]
    var cnt = 0
    var v = 0
    while (v < n) {
      if (keep(v)) { old2new(v) = cnt; newIds += v; cnt += 1 }
      v += 1
    }
    val ids = newIds.result()
    val newAdj = new Array[Array[Int]](cnt)
    var i = 0
    while (i < cnt) {
      newAdj(i) = adj(ids(i)).collect { case u if keep(u) => old2new(u) }
      i += 1
    }
    (new AdjGraph(cnt, newAdj), ids)
  }

  /** Induced subgraph on a vertex set given as old ids. */
  def inducedOn(vertices: Iterable[Int]): (AdjGraph, Array[Int]) = {
    val keep = new Array[Boolean](n)
    vertices.foreach(keep(_) = true)
    induced(keep)
  }

  /** Largest connected component, relabeled. Returns (subgraph, old ids). */
  def largestComponent(): (AdjGraph, Array[Int]) = {
    val comp = components()
    if (n == 0) return (this, Array.empty)
    val sizes = mutable.Map.empty[Int, Int].withDefaultValue(0)
    comp.foreach(c => sizes(c) += 1)
    val big = sizes.maxBy(_._2)._1
    val keep = comp.map(_ == big)
    induced(keep)
  }
}

object AdjGraph {

  /** Build from an undirected edge list; drops self-loops and duplicates. */
  def fromEdges(n: Int, edgeIt: IterableOnce[(Int, Int)]): AdjGraph = {
    val sets = Array.fill(n)(mutable.SortedSet.empty[Int])
    edgeIt.iterator.foreach { case (a, b) =>
      require(a >= 0 && a < n && b >= 0 && b < n, s"edge ($a,$b) out of range [0,$n)")
      if (a != b) { sets(a) += b; sets(b) += a }
    }
    new AdjGraph(n, sets.map(_.toArray))
  }

  /** Empty graph on n vertices. */
  def empty(n: Int): AdjGraph = new AdjGraph(n, Array.fill(n)(Array.empty[Int]))
}
