package repro.graphgen

import org.scalatest.funsuite.AnyFunSuite

class GraphGenSpec extends AnyFunSuite {

  test("er produces exactly m distinct edges") {
    val g = GraphGen.er(50, 80, 1)
    assert(g.n == 50 && g.numEdges == 80)
  }

  test("er is deterministic in the seed") {
    assert(GraphGen.er(40, 60, 7).edges.toSeq == GraphGen.er(40, 60, 7).edges.toSeq)
    assert(GraphGen.er(40, 60, 7).edges.toSeq != GraphGen.er(40, 60, 8).edges.toSeq)
  }

  test("er rejects infeasible edge counts") {
    intercept[IllegalArgumentException] { GraphGen.er(4, 10, 1) }
  }

  test("ba attaches every newcomer to mAttach distinct vertices") {
    val g = GraphGen.ba(100, 4, 3, 2)
    assert(g.n == 100)
    // m0 clique + (n - m0) * mAttach edges (dedup can only reduce)
    assert(g.numEdges <= 6 + 96 * 3)
    assert(g.numEdges >= 6 + 96 * 2) // near-complete attachment
    // preferential attachment concentrates degree
    val degs = (0 until g.n).map(g.degree)
    assert(degs.max >= 3 * degs.sum / g.n)
  }

  test("ba is deterministic in the seed") {
    assert(GraphGen.ba(60, 3, 2, 5).edges.toSeq == GraphGen.ba(60, 3, 2, 5).edges.toSeq)
  }

  test("ws keeps ring connectivity at beta=0") {
    val g = GraphGen.ws(30, 2, 0.0, 1)
    assert(g.components().distinct.length == 1)
    assert(g.numEdges == 60)
  }

  test("ws rewires some edges at beta=0.5") {
    val g0 = GraphGen.ws(40, 2, 0.0, 3)
    val g1 = GraphGen.ws(40, 2, 0.5, 3)
    assert(g0.edges.toSeq != g1.edges.toSeq)
  }

  test("gridRoad keeps a connected largest component with tiny degrees") {
    val g = GraphGen.gridRoad(20, 20, 0.8, 4)
    assert(g.components().distinct.length == 1)
    assert((0 until g.n).map(g.degree).max <= 4)
    assert(g.n <= 400)
  }

  test("communities yields intra-dense inter-sparse structure") {
    val g = GraphGen.communities(4, 25, 0.4, 0.01, 5)
    assert(g.n <= 100)
    // average degree dominated by intra-community edges
    assert(2.0 * g.numEdges / g.n > 5)
  }

  test("canned graphs have the expected shapes") {
    assert(GraphGen.path(5).numEdges == 4)
    assert(GraphGen.cycle(5).numEdges == 5)
    assert(GraphGen.clique(5).numEdges == 10)
    assert(GraphGen.star(5).numEdges == 4)
    assert(GraphGen.petersen.numEdges == 15)
    assert((0 until 10).forall(GraphGen.petersen.degree(_) == 3))
  }

  test("figure1 has 13 vertices and 19 edges") {
    val g = GraphGen.figure1
    assert(g.n == 13 && g.numEdges == 19)
    assert(g.components().distinct.length == 1)
  }

  test("powerGraph squares distances correctly") {
    val p = GraphGen.powerGraph(GraphGen.path(5), 2)
    // 0-1-2-3-4 squared: i~j iff |i-j| <= 2
    assert(p.numEdges == 4 + 3)
    assert(p.adj(0).toSeq == Seq(1, 2))
    val p3 = GraphGen.powerGraph(GraphGen.cycle(7), 3)
    assert((0 until 7).forall(p3.degree(_) == 6)) // everything within 3 hops
  }

  test("powerGraph of a disconnected graph stays disconnected") {
    val g = repro.core.AdjGraph.fromEdges(5, Seq((0, 1), (2, 3)))
    val p = GraphGen.powerGraph(g, 3)
    assert(p.degree(4) == 0)
    assert(!p.adj(0).contains(2))
  }

  test("randomConnected always returns a single component") {
    for (seed <- 1 to 10) {
      val g = GraphGen.randomConnected(50, 2.0, seed)
      assert(g.components().distinct.length == 1, s"seed=$seed")
    }
  }
}
