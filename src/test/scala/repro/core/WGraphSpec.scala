package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtils

class WGraphSpec extends AnyFunSuite {

  private def triangle = WGraph.fromEdges(3, Seq((0, 1), (1, 2), (0, 2)))

  test("fromEdges builds sorted adjacency") {
    val g = WGraph.fromEdges(4, Seq((2, 0), (0, 1), (3, 0)))
    assert(g.adj(0).toSeq == Seq(1, 2, 3))
    assert(g.adj(1).toSeq == Seq(0))
  }

  test("fromEdges collapses duplicates and both orientations") {
    val g = WGraph.fromEdges(3, Seq((0, 1), (1, 0), (0, 1)))
    assert(g.numEdges == 1)
  }

  test("fromEdges drops self-loops") {
    val g = WGraph.fromEdges(3, Seq((0, 0), (0, 1)))
    assert(g.numEdges == 1)
  }

  test("hasEdge both directions") {
    val g = triangle
    assert(g.hasEdge(0, 2) && g.hasEdge(2, 0) && !g.hasEdge(0, 0))
  }

  test("edges lists each edge once with u < v") {
    val g = triangle
    assert(g.edges.toSet == Set((0, 1), (0, 2), (1, 2)))
  }

  test("totalWeight sums each edge once") {
    val s = SymMatrix.zeros(3)
    s.update(0, 1, 1.0); s.update(1, 2, 2.0); s.update(0, 2, 4.0)
    assert(triangle.totalWeight(s) == 7.0)
  }

  test("weightedDegrees") {
    val s = SymMatrix.zeros(3)
    s.update(0, 1, 1.0); s.update(1, 2, 2.0); s.update(0, 2, 4.0)
    assert(triangle.weightedDegrees(s).toSeq == Seq(5.0, 3.0, 6.0))
  }

  test("isConnectedExcluding: path graph split by middle vertex") {
    val g = WGraph.fromEdges(3, Seq((0, 1), (1, 2)))
    assert(g.isConnectedExcluding(Set.empty))
    assert(!g.isConnectedExcluding(Set(1)))
  }

  test("isConnectedExcluding: everything excluded is vacuously connected") {
    assert(triangle.isConnectedExcluding(Set(0, 1, 2)))
  }

  test("degree counts neighbors") {
    val g = WGraph.fromEdges(4, Seq((0, 1), (0, 2), (0, 3)))
    assert(g.degree(0) == 3 && g.degree(3) == 1)
  }

  test("numEdges on a TMFG-size random graph") {
    val s = TestUtils.randomSim(20, 3)
    Par.withThreads(2) { par =>
      val g = Tmfg.build(s, 1, par).graph
      assert(g.numEdges == 3 * 20 - 6)
    }
  }
}
