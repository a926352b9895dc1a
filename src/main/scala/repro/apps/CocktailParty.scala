package repro.apps

import repro.core.{AdjGraph, Algo, KHCore}

/** Distance-generalized cocktail party (Appendix B, Problem 2): given query
  * vertices Q, find a connected S ⊇ Q maximizing the minimum h-degree of
  * G[S]. The optimum is the connected component, inside the (k,h)-core with
  * the largest k, that contains all of Q — found by descending k.
  */
object CocktailParty {

  /** Returns (k, community vertices), or None if Q is not connected even in
    * the (0,h)-core (i.e., Q spans several components of G).
    */
  def solve(g: AdjGraph, h: Int, query: Seq[Int],
            algo: Algo = Algo.HLBUB(None)): Option[(Int, Array[Int])] = {
    require(query.nonEmpty && query.forall(q => q >= 0 && q < g.n))
    val decomp = KHCore.decompose(g, h, algo)
    val kTop = query.map(decomp.core).min // Q must survive in the core
    var k = kTop
    while (k >= 0) {
      val verts = decomp.coreVertices(k)
      val (sub, ids) = g.inducedOn(verts.toSeq)
      val comp = sub.components()
      val qComps = query.map(q => comp(ids.indexOf(q))).distinct
      if (qComps.size == 1) {
        val c = qComps.head
        val members = (0 until sub.n).filter(comp(_) == c).map(ids).toArray
        return Some((k, members))
      }
      k -= 1
    }
    None
  }

  /** Objective value: min h-degree of the subgraph induced by `vertices`. */
  def minHDegree(g: AdjGraph, vertices: Array[Int], h: Int): Int = {
    if (vertices.isEmpty) return 0
    val (sub, _) = g.inducedOn(vertices.toSeq)
    repro.core.HBfs.allHDegrees(sub, h).min
  }
}
