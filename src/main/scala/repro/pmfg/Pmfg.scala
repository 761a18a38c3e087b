package repro.pmfg

import repro.core.{SymMatrix, WGraph}
import scala.collection.mutable.ArrayBuffer

/** Planar Maximally Filtered Graph (Tumminello et al. 2005) — the
  * sequential baseline the paper compares against (PMFG-DBHT).
  *
  * All O(n^2) candidate edges are sorted by decreasing similarity; each
  * is added iff the graph stays planar, verified with a full LR planarity
  * test per candidate — exactly the Theta(n^2) planarity-test loop that
  * makes the baseline slow (paper §II). We stop early once 3n-6 edges are
  * accepted, because a maximal planar graph cannot take another edge.
  */
object Pmfg {

  def build(s: SymMatrix): WGraph = {
    val n = s.n
    require(n >= 3, s"PMFG needs at least 3 vertices, got $n")
    val target = 3 * n - 6

    // all candidate edges sorted by decreasing weight (ties by id for determinism)
    val cand = new ArrayBuffer[(Int, Int)](n * (n - 1) / 2)
    for (i <- 0 until n; j <- i + 1 until n) cand += ((i, j))
    val sorted = cand.sortBy { case (i, j) => (-s(i, j), i, j) }

    val accepted = new ArrayBuffer[(Int, Int)](target)
    var idx = 0
    while (idx < sorted.length && accepted.length < target) {
      val e = sorted(idx)
      accepted += e
      if (!Planarity.isPlanar(n, accepted)) accepted.remove(accepted.length - 1)
      idx += 1
    }
    WGraph.fromEdges(n, accepted)
  }
}
