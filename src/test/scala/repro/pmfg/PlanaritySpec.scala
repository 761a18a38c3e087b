package repro.pmfg

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtils
import repro.core.{Par, Tmfg}
import scala.util.Random

class PlanaritySpec extends AnyFunSuite {

  private def complete(n: Int): Seq[(Int, Int)] =
    for (i <- 0 until n; j <- i + 1 until n) yield (i, j)

  private def completeBipartite(a: Int, b: Int): Seq[(Int, Int)] =
    for (i <- 0 until a; j <- 0 until b) yield (i, a + j)

  test("empty graph, single vertex, single edge are planar") {
    assert(Planarity.isPlanar(0, Nil))
    assert(Planarity.isPlanar(1, Nil))
    assert(Planarity.isPlanar(2, Seq((0, 1))))
  }

  test("trees are planar") {
    val rng = new Random(1)
    for (n <- Seq(5, 50, 500)) {
      val edges = (1 until n).map(v => (rng.nextInt(v), v))
      assert(Planarity.isPlanar(n, edges), s"n=$n")
    }
  }

  test("a long path is planar (deep DFS, no stack overflow)") {
    val n = 20000
    assert(Planarity.isPlanar(n, (0 until n - 1).map(v => (v, v + 1))))
  }

  test("cycles are planar") {
    for (n <- Seq(3, 10, 100)) {
      val edges = (0 until n).map(v => (v, (v + 1) % n))
      assert(Planarity.isPlanar(n, edges))
    }
  }

  test("grids are planar") {
    val w = 15; val h = 12
    def id(x: Int, y: Int) = y * w + x
    val edges = (for (y <- 0 until h; x <- 0 until w) yield {
      Seq((x, y, x + 1, y), (x, y, x, y + 1))
        .filter { case (_, _, a, b) => a < w && b < h }
        .map { case (x0, y0, x1, y1) => (id(x0, y0), id(x1, y1)) }
    }).flatten
    assert(Planarity.isPlanar(w * h, edges))
  }

  test("K4 is planar, K5 is not") {
    assert(Planarity.isPlanar(4, complete(4)))
    assert(!Planarity.isPlanar(5, complete(5)))
  }

  test("K6, K7 are not planar") {
    assert(!Planarity.isPlanar(6, complete(6)))
    assert(!Planarity.isPlanar(7, complete(7)))
  }

  test("K3,3 is not planar, K2,3 is") {
    assert(!Planarity.isPlanar(6, completeBipartite(3, 3)))
    assert(Planarity.isPlanar(5, completeBipartite(2, 3)))
  }

  test("Petersen graph is not planar (edge bound does not catch it)") {
    val outer = (0 until 5).map(v => (v, (v + 1) % 5))
    val spokes = (0 until 5).map(v => (v, v + 5))
    val inner = (0 until 5).map(v => (5 + v, 5 + (v + 2) % 5))
    val edges = outer ++ spokes ++ inner
    assert(edges.size == 15 && 15 <= 3 * 10 - 6) // below the Euler bound
    assert(!Planarity.isPlanar(10, edges))
  }

  test("subdivided K5 is not planar") {
    // replace each K5 edge with a 2-edge path through a fresh vertex:
    // 10 extra vertices, still non-planar, far below the edge bound
    var next = 5
    val edges = complete(5).flatMap { case (u, v) =>
      val mid = next; next += 1
      Seq((u, mid), (mid, v))
    }
    assert(!Planarity.isPlanar(next, edges))
  }

  test("subdivided K3,3 is not planar") {
    var next = 6
    val edges = completeBipartite(3, 3).flatMap { case (u, v) =>
      val mid = next; next += 1
      Seq((u, mid), (mid, v))
    }
    assert(!Planarity.isPlanar(next, edges))
  }

  test("disconnected graph: planar iff all components planar") {
    // component 1: K4 (planar), component 2: triangle
    val edges = complete(4) ++ Seq((4, 5), (5, 6), (4, 6))
    assert(Planarity.isPlanar(7, edges))
    // component 2 becomes K5 (shifted by 4): not planar
    val bad = complete(4) ++ complete(5).map { case (u, v) => (u + 4, v + 4) }
    assert(!Planarity.isPlanar(9, bad))
  }

  test("K5 minus any edge is planar") {
    val all = complete(5)
    for (drop <- all)
      assert(Planarity.isPlanar(5, all.filterNot(_ == drop)), s"dropped $drop")
  }

  test("K3,3 minus any edge is planar") {
    val all = completeBipartite(3, 3)
    for (drop <- all)
      assert(Planarity.isPlanar(6, all.filterNot(_ == drop)), s"dropped $drop")
  }

  test("TMFGs are planar; TMFG plus any chord is not") {
    for (seed <- 1L to 3L) {
      val s = TestUtils.randomSim(30, seed)
      val g = Par.withThreads(2)(par => Tmfg.build(s, 2, par)).graph
      assert(Planarity.isPlanar(30, g.edges))
      val nonEdge = (for {
        u <- 0 until 30; v <- u + 1 until 30; if !g.hasEdge(u, v)
      } yield (u, v)).head
      assert(!Planarity.isPlanar(30, g.edges :+ nonEdge))
    }
  }

  test("TMFG minus random edges stays planar (subgraphs of planar graphs)") {
    val s = TestUtils.randomSim(40, 4)
    val g = Par.withThreads(2)(par => Tmfg.build(s, 3, par)).graph
    val rng = new Random(5)
    val edges = rng.shuffle(g.edges.toVector)
    for (keep <- Seq(10, 40, 80))
      assert(Planarity.isPlanar(40, edges.take(keep)), s"keep=$keep")
  }

  test("edge-count quick reject: any graph above 3n-6 edges is refused") {
    // dense random graph over 12 vertices with > 30 edges
    val edges = complete(12).take(40)
    assert(!Planarity.isPlanar(12, edges))
  }

  test("parallel edges and self-loops are tolerated") {
    assert(Planarity.isPlanar(3, Seq((0, 1), (1, 0), (0, 0), (1, 2), (1, 2))))
  }

  test("random graphs: verdict matches a K5/K3,3-free witness heuristic on small n") {
    // On n <= 6, non-planarity happens iff the graph contains K5 or K3,3
    // as a (sub)graph after removing degree-2 subdivision vertices; for
    // n <= 4 everything is planar.
    val rng = new Random(6)
    for (_ <- 1 to 50) {
      val n = 4
      val edges = complete(n).filter(_ => rng.nextBoolean())
      assert(Planarity.isPlanar(n, edges))
    }
  }
}
