package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtils

class BubbleTreeSpec extends AnyFunSuite {

  private def build(n: Int, prefix: Int, seed: Long = 1): TmfgResult =
    Par.withThreads(4)(par => Tmfg.build(TestUtils.randomSim(n, seed), prefix, par))

  test("TMFG over n vertices yields exactly n-3 bubbles") {
    for (n <- Seq(4, 5, 10, 50); prefix <- Seq(1, 5)) {
      val res = build(n, prefix, seed = n)
      assert(res.tree.numBubbles == n - 3, s"n=$n prefix=$prefix")
    }
  }

  test("every bubble is a 4-clique in the TMFG") {
    val res = build(40, 3)
    for (b <- 0 until res.tree.numBubbles) {
      val vs = res.tree.verts(b)
      assert(vs.length == 4)
      for (i <- 0 until 4; j <- i + 1 until 4)
        assert(res.graph.hasEdge(vs(i), vs(j)), s"bubble $b missing edge ${vs(i)}-${vs(j)}")
    }
  }

  test("bubble tree is a tree: n-4 edges, connected from root") {
    val res = build(30, 4)
    val tree = res.tree
    val edgeCount = (0 until tree.numBubbles).count(tree.parent(_) != -1)
    assert(edgeCount == tree.numBubbles - 1)
    assert(tree.topoOrder.length == tree.numBubbles) // topoOrder asserts connectivity
  }

  test("non-root bubbles share exactly their separating triangle with the parent") {
    val res = build(35, 6)
    val tree = res.tree
    for (b <- 0 until tree.numBubbles; if b != tree.root) {
      val shared = tree.verts(b).toSet.intersect(tree.verts(tree.parent(b)).toSet)
      assert(shared == tree.sepTri(b).toSet, s"bubble $b")
      assert(!shared.contains(tree.innerVert(b)))
    }
  }

  test("each bubble has at most 3 children") {
    for (prefix <- Seq(1, 8)) {
      val res = build(60, prefix, seed = prefix)
      val tree = res.tree
      for (b <- 0 until tree.numBubbles)
        assert(tree.children(b).length <= 3, s"bubble $b has ${tree.children(b).length} children")
    }
  }

  test("separating triangles actually separate the TMFG") {
    val res = build(25, 1)
    val tree = res.tree
    for (b <- 0 until tree.numBubbles; if b != tree.root) {
      val tri = tree.sepTri(b).toSet
      assert(!res.graph.isConnectedExcluding(tri), s"triangle of bubble $b does not separate")
    }
  }

  test("descendant invariant: subtree vertices lie inside the separating triangle") {
    val res = build(30, 1)
    val tree = res.tree
    val g = res.graph
    for (b <- 0 until tree.numBubbles; if b != tree.root) {
      // vertices strictly interior to sepTri(b) per BFS from innerVert
      val tri = tree.sepTri(b)
      val (interior, _) = interiorOf(g, tri, tree.innerVert(b))
      // collect subtree inner vertices
      val sub = collection.mutable.Set[Int]()
      def rec(x: Int): Unit = { sub += tree.innerVert(x); tree.children(x).foreach(rec) }
      rec(b)
      assert(sub == interior, s"bubble $b: subtree=$sub interior=$interior")
    }
  }

  private def interiorOf(g: WGraph, tri: Array[Int], seed: Int): (collection.mutable.Set[Int], Unit) = {
    val tset = tri.toSet
    val seen = collection.mutable.Set[Int]() ++ tset + seed
    val interior = collection.mutable.Set(seed)
    val queue = collection.mutable.Queue(seed)
    while (queue.nonEmpty) {
      val u = queue.dequeue()
      for (w <- g.adj(u); if !seen.contains(w)) { seen += w; interior += w; queue.enqueue(w) }
    }
    (interior, ())
  }

  test("paper Example 1: inserting into the outer face re-roots the tree") {
    // Reproduce the paper's walk-through directly on the tree API:
    // start with C = {0,1,2,4}, outer face {0,1,2}; insert 3 into the
    // outer face, then 5 into {1,2,3} and 6 into {0,1,3}.
    val tree = new BubbleTree(7)
    val b1 = tree.addBubble(Array(0, 1, 2, 4))
    tree.root = b1
    // insert 3 into outer face {0,1,2}: new bubble becomes the root
    val b2 = tree.addBubble(Array(0, 1, 2, 3))
    tree.link(b2, b1, Array(0, 1, 2))
    tree.root = b2
    // insert 5 into inner face {1,2,3} of b2
    val b4 = tree.addBubble(Array(1, 2, 3, 5))
    tree.link(b2, b4, Array(1, 2, 3))
    // insert 6 into the (new) outer face {0,1,3} of b2
    val b3 = tree.addBubble(Array(0, 1, 3, 6))
    tree.link(b3, b2, Array(0, 1, 3))
    tree.root = b3

    assert(tree.root == b3)
    assert(tree.parent(b2) == b3)
    assert(tree.parent(b1) == b2 && tree.parent(b4) == b2)
    assert(tree.children(b2).toSet == Set(b1, b4))
    assert(tree.innerVert(b1) == 4)
    assert(tree.innerVert(b2) == 2)
    assert(tree.innerVert(b4) == 5)
    // creation order was b1, b2, b4, b3 -> depths 2, 1, 2, 0
    assert(tree.depths.toSeq == Seq(2, 1, 2, 0))
  }

  test("directions match brute-force BFS interior/exterior computation") {
    for (seed <- 1L to 4L; prefix <- Seq(1, 6)) {
      val s = TestUtils.randomSim(30, seed)
      val res = Par.withThreads(4)(par => Tmfg.build(s, prefix, par))
      val wdeg = res.graph.weightedDegrees(s)
      val dirs = Par.withThreads(4)(par =>
        BubbleDirections.compute(res.tree, res.graph, s, wdeg, par))
      val tree = res.tree
      for (b <- 0 until tree.numBubbles; if b != tree.root) {
        val (inV, outV) = TestUtils.bruteInOutVals(res.graph, s, tree.sepTri(b), tree.innerVert(b))
        assert(dirs.towardChild(b) == (inV > outV),
          s"seed=$seed prefix=$prefix bubble=$b in=$inV out=$outV")
      }
    }
  }

  test("directions identical across thread counts") {
    val s = TestUtils.randomSim(50, 12)
    val res = Par.withThreads(4)(par => Tmfg.build(s, 5, par))
    val wdeg = res.graph.weightedDegrees(s)
    val d1 = Par.withThreads(1)(par => BubbleDirections.compute(res.tree, res.graph, s, wdeg, par))
    val d8 = Par.withThreads(8)(par => BubbleDirections.compute(res.tree, res.graph, s, wdeg, par))
    assert(d1.towardChild.sameElements(d8.towardChild))
  }

  test("out-degree + converging bubbles are consistent") {
    val s = TestUtils.randomSim(40, 8)
    val res = Par.withThreads(2)(par => Tmfg.build(s, 3, par))
    val wdeg = res.graph.weightedDegrees(s)
    val dirs = Par.withThreads(2)(par => BubbleDirections.compute(res.tree, res.graph, s, wdeg, par))
    val conv = dirs.convergingBubbles
    assert(conv.nonEmpty, "a finite directed tree must have a sink")
    for (b <- conv) assert(dirs.outNeighbors(b).isEmpty)
    // total out-degree == number of edges
    val total = (0 until res.tree.numBubbles).map(dirs.outDegree).sum
    assert(total == res.tree.numBubbles - 1)
  }

  test("single-bubble tree has no directions and is its own converging bubble") {
    val s = TestUtils.randomSim(4, 3)
    val res = Par.withThreads(1)(par => Tmfg.build(s, 1, par))
    val wdeg = res.graph.weightedDegrees(s)
    val dirs = Par.withThreads(1)(par => BubbleDirections.compute(res.tree, res.graph, s, wdeg, par))
    assert(dirs.convergingBubbles.toSeq == Seq(0))
  }

  test("addBubble rejects non-4-cliques") {
    val tree = new BubbleTree(10)
    intercept[IllegalArgumentException](tree.addBubble(Array(1, 2, 3)))
  }
}
