package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.graphgen.GraphGen

class AdjGraphSpec extends AnyFunSuite {

  test("fromEdges drops self-loops and duplicate edges") {
    val g = AdjGraph.fromEdges(4, Seq((0, 1), (1, 0), (1, 1), (2, 3), (2, 3)))
    assert(g.numEdges == 2)
    assert(g.adj(1).toSeq == Seq(0))
    assert(g.adj(2).toSeq == Seq(3))
  }

  test("fromEdges rejects out-of-range vertices") {
    intercept[IllegalArgumentException] { AdjGraph.fromEdges(3, Seq((0, 3))) }
  }

  test("degree and numEdges on a clique") {
    val g = GraphGen.clique(6)
    assert((0 until 6).forall(g.degree(_) == 5))
    assert(g.numEdges == 15)
  }

  test("bfsDistances on a path") {
    val g = GraphGen.path(5)
    assert(g.bfsDistances(0).toSeq == Seq(0, 1, 2, 3, 4))
    assert(g.bfsDistances(2).toSeq == Seq(2, 1, 0, 1, 2))
  }

  test("bfsDistances marks unreachable as -1") {
    val g = AdjGraph.fromEdges(4, Seq((0, 1)))
    val d = g.bfsDistances(0)
    assert(d(2) == -1 && d(3) == -1)
  }

  test("components on a disconnected graph") {
    val g = AdjGraph.fromEdges(6, Seq((0, 1), (1, 2), (3, 4)))
    val c = g.components()
    assert(c(0) == c(1) && c(1) == c(2))
    assert(c(3) == c(4) && c(3) != c(0))
    assert(c(5) != c(0) && c(5) != c(3))
  }

  test("diameterExact of canned graphs") {
    assert(GraphGen.path(6).diameterExact() == 5)
    assert(GraphGen.cycle(8).diameterExact() == 4)
    assert(GraphGen.clique(5).diameterExact() == 1)
    assert(GraphGen.star(7).diameterExact() == 2)
    assert(GraphGen.petersen.diameterExact() == 2)
  }

  test("diameterLowerBound never exceeds the exact diameter") {
    for (seed <- 1 to 5) {
      val g = GraphGen.randomConnected(60, 3.0, seed)
      assert(g.diameterLowerBound() <= g.diameterExact())
    }
  }

  test("induced subgraph keeps only internal edges") {
    val g = GraphGen.cycle(6)
    val (sub, ids) = g.inducedOn(Seq(0, 1, 2, 4))
    assert(sub.n == 4)
    assert(ids.toSeq == Seq(0, 1, 2, 4))
    assert(sub.numEdges == 2) // 0-1, 1-2; vertex 4 isolated
  }

  test("largestComponent picks the bigger side") {
    val g = AdjGraph.fromEdges(7, Seq((0, 1), (1, 2), (2, 3), (4, 5)))
    val (big, ids) = g.largestComponent()
    assert(big.n == 4)
    assert(ids.toSeq == Seq(0, 1, 2, 3))
  }

  test("edges returns the sorted canonical edge list") {
    val g = AdjGraph.fromEdges(4, Seq((2, 1), (0, 3), (3, 0)))
    assert(g.edges.toSeq == Seq((0, 3), (1, 2)))
  }
}
