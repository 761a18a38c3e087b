package repro.core

import scala.collection.mutable.ArrayBuffer

/** Undirected graph over vertices 0..n-1 as sorted adjacency arrays.
  *
  * Edge weights are not stored here: every consumer reads them from the
  * similarity matrix `S` or the dissimilarity matrix `D` (the DBHT
  * pipeline needs *both* measures on the same topology, so storing the
  * topology once is both smaller and unambiguous).
  */
final class WGraph(val n: Int, val adj: Array[Array[Int]]) extends Serializable {

  def degree(v: Int): Int = adj(v).length

  def numEdges: Int = {
    var s = 0; var i = 0
    while (i < n) { s += adj(i).length; i += 1 }
    s / 2
  }

  def hasEdge(u: Int, v: Int): Boolean = java.util.Arrays.binarySearch(adj(u), v) >= 0

  /** All edges as (u, v) with u < v. */
  def edges: IndexedSeq[(Int, Int)] = {
    val out = new ArrayBuffer[(Int, Int)]()
    var u = 0
    while (u < n) {
      val a = adj(u)
      var k = 0
      while (k < a.length) { if (a(k) > u) out += ((u, a(k))); k += 1 }
      u += 1
    }
    out.toIndexedSeq
  }

  /** Sum of w(u,v) over all edges, weights read from `w`. */
  def totalWeight(w: SymMatrix): Double = {
    var s = 0.0
    var u = 0
    while (u < n) {
      val a = adj(u)
      var k = 0
      while (k < a.length) { if (a(k) > u) s += w(u, a(k)); k += 1 }
      u += 1
    }
    s
  }

  /** Weighted degree of every vertex under weight matrix `w`. */
  def weightedDegrees(w: SymMatrix): Array[Double] = {
    val d = new Array[Double](n)
    var u = 0
    while (u < n) {
      val a = adj(u)
      var s = 0.0
      var k = 0
      while (k < a.length) { s += w(u, a(k)); k += 1 }
      d(u) = s
      u += 1
    }
    d
  }

  /** Connected-component check via BFS, skipping vertices in `excluded`. */
  def isConnectedExcluding(excluded: Set[Int]): Boolean = {
    val active = (0 until n).filterNot(excluded.contains)
    if (active.isEmpty) return true
    val seen  = new Array[Boolean](n)
    excluded.foreach(v => seen(v) = true)
    val queue = new java.util.ArrayDeque[Integer]()
    queue.add(active.head); seen(active.head) = true
    var count = 1
    while (!queue.isEmpty) {
      val u = queue.poll().intValue()
      val a = adj(u)
      var k = 0
      while (k < a.length) {
        val v = a(k)
        if (!seen(v)) { seen(v) = true; count += 1; queue.add(v) }
        k += 1
      }
    }
    count == active.size
  }
}

object WGraph {
  /** Build from an undirected edge list (duplicates collapsed). */
  def fromEdges(n: Int, edges: Iterable[(Int, Int)]): WGraph = {
    val bufs = Array.fill(n)(new ArrayBuffer[Int]())
    for ((u, v) <- edges if u != v) { bufs(u) += v; bufs(v) += u }
    val adj = bufs.map(b => b.distinct.sorted.toArray)
    new WGraph(n, adj)
  }
}
