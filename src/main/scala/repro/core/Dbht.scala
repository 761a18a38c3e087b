package repro.core

import scala.collection.mutable.ArrayBuffer

/** A directed bubble decomposition in the generic form consumed by the
  * DBHT assignment/dendrogram stages: works both for the optimized TMFG
  * bubble tree (every bubble a 4-clique) and for the original quadratic
  * decomposition of arbitrary maximal planar graphs (PMFG bubbles may
  * have more than four vertices).
  *
  * @param n        number of graph vertices
  * @param vertsOf  vertices of each bubble
  * @param treeAdj  undirected bubble-tree adjacency
  * @param outNbrs  directed out-neighbors of each bubble
  */
final case class Bubbles(n: Int,
                         vertsOf: Array[Array[Int]],
                         treeAdj: Array[Array[Int]],
                         outNbrs: Array[Array[Int]]) {
  def numBubbles: Int = vertsOf.length

  def convergingBubbles: Array[Int] =
    (0 until numBubbles).filter(outNbrs(_).isEmpty).toArray

  /** bubble ids containing each vertex. */
  def bubblesOfVertex: Array[Array[Int]] = {
    val bufs = Array.fill(n)(new ArrayBuffer[Int](4))
    for (b <- 0 until numBubbles; v <- vertsOf(b)) bufs(v) += b
    bufs.map(_.toArray)
  }
}

/** Parallel DBHT (paper §V, Algorithm 4) on a directed bubble
  * decomposition: two-level vertex assignment (converging-bubble groups
  * via the chi attachment / mean shortest-path, then bubbles via chi'),
  * followed by the three-level complete-linkage dendrogram with the
  * paper's height re-assignment.
  */
object Dbht {

  /** Group (converging bubble) and bubble assignment per vertex. */
  final case class Assignments(group: Array[Int], bubble: Array[Int], converging: Array[Int])

  /** Convert an optimized TMFG bubble tree into the generic form,
    * computing edge directions with the O(n) recursive algorithm.
    */
  def bubblesFromTmfg(res: TmfgResult, s: SymMatrix, par: Par): Bubbles = {
    val tree = res.tree
    val wdeg = res.graph.weightedDegrees(s)
    val dirs = BubbleDirections.compute(tree, res.graph, s, wdeg, par)
    val nb = tree.numBubbles
    val treeAdj = Array.tabulate(nb) { b =>
      val a = new ArrayBuffer[Int](4)
      if (b != tree.root) a += tree.parent(b)
      a ++= tree.children(b)
      a.toArray
    }
    val outNbrs = Array.tabulate(nb)(b => dirs.outNeighbors(b).toArray)
    Bubbles(res.graph.n, Array.tabulate(nb)(tree.verts(_).clone()), treeAdj, outNbrs)
  }

  /** Which converging bubbles each bubble can reach along directed edges
    * (paper Algorithm 4, Lines 5-6): one BFS per bubble, in parallel.
    */
  def reachableConverging(bub: Bubbles, par: Par): Array[Array[Int]] = {
    val nb = bub.numBubbles
    val conv = bub.outNbrs.map(_.isEmpty)
    par.parMap(nb, grain = 8) { start =>
      val seen = new java.util.HashSet[Integer]()
      val out  = new ArrayBuffer[Int]()
      val queue = new java.util.ArrayDeque[Integer]()
      queue.add(start); seen.add(start)
      while (!queue.isEmpty) {
        val b = queue.poll().intValue()
        if (conv(b)) out += b
        for (c <- bub.outNbrs(b)) if (seen.add(c)) queue.add(c)
      }
      out.sorted.toArray
    }
  }

  /** chi attachment of vertex v to bubble b (paper §V-C): sum of edge
    * weights from v to bubble members, normalized by the bubble's edge
    * count 3(|b|-2). Only graph edges contribute (for TMFG bubbles every
    * member pair is an edge).
    */
  private def chi(v: Int, b: Int, bub: Bubbles, g: WGraph, s: SymMatrix): Double = {
    var acc = 0.0
    for (u <- bub.vertsOf(b)) if (u != v && g.hasEdge(u, v)) acc += s(u, v)
    acc / (3.0 * (bub.vertsOf(b).length - 2))
  }

  /** chi' attachment for the second-level (bubble) assignment: the sum of
    * edge weights from v into b over the total edge weight within b.
    */
  private def chiPrime(v: Int, b: Int, bub: Bubbles, g: WGraph, s: SymMatrix): Double = {
    var num = 0.0
    for (u <- bub.vertsOf(b)) if (u != v && g.hasEdge(u, v)) num += s(u, v)
    val vs = bub.vertsOf(b)
    var den = 0.0
    var i = 0
    while (i < vs.length) {
      var j = i + 1
      while (j < vs.length) {
        if (g.hasEdge(vs(i), vs(j))) den += s(vs(i), vs(j))
        j += 1
      }
      i += 1
    }
    if (den == 0.0) 0.0 else num / den
  }

  /** Two-level vertex assignment (Algorithm 4, Lines 1-23). */
  def assign(bub: Bubbles, g: WGraph, s: SymMatrix, apspD: SymMatrix, par: Par): Assignments = {
    val n = bub.n
    val conv = bub.convergingBubbles
    val isConv = new Array[Boolean](bub.numBubbles)
    conv.foreach(isConv(_) = true)
    val reach = reachableConverging(bub, par)
    val byVertex = bub.bubblesOfVertex

    // --- level 1: groups. WRITEMAX((chi, b)) over converging bubbles
    // containing v; ties prefer the larger bubble id. ---
    val group = Array.fill(n)(-1)
    par.parFor(n, grain = 64) { v =>
      var bestB = -1
      var bestChi = Double.NegativeInfinity
      for (b <- byVertex(v); if isConv(b)) {
        val x = chi(v, b, bub, g, s)
        if (x > bestChi || (x == bestChi && b > bestB)) { bestChi = x; bestB = b }
      }
      group(v) = bestB
    }

    // V_b^0: vertices assigned to each converging bubble so far
    val v0 = conv.map(b => (b, (0 until n).filter(group(_) == b).toArray)).toMap

    // --- vertices in no converging bubble: WRITEMIN((Lbar, b)) over
    // reachable converging bubbles; ties prefer the smaller bubble id. ---
    par.parFor(n, grain = 64) { v =>
      if (group(v) == -1) {
        // converging bubbles reachable from any bubble containing v
        val cand = byVertex(v).flatMap(reach(_)).distinct
        var bestB = -1
        var bestL = Double.PositiveInfinity
        for (b <- cand) {
          val mem = v0(b)
          if (mem.nonEmpty) {
            var acc = 0.0
            for (u <- mem) acc += apspD(u, v)
            val lbar = acc / mem.length
            if (lbar < bestL || (lbar == bestL && (bestB == -1 || b < bestB))) { bestL = lbar; bestB = b }
          }
        }
        if (bestB == -1) {
          // every reachable converging bubble is empty so far (possible
          // only in degenerate inputs): fall back to max chi over them
          var bc = Double.NegativeInfinity
          for (b <- cand) {
            val x = chi(v, b, bub, g, s)
            if (x > bc || (x == bc && b > bestB)) { bc = x; bestB = b }
          }
          if (bestB == -1 && conv.nonEmpty) bestB = conv(0)
        }
        group(v) = bestB
      }
    }

    // --- level 2: bubble assignment via chi' over bubbles containing v,
    // ties prefer the larger bubble id (WRITEMAX). ---
    val bubbleOf = Array.fill(n)(-1)
    par.parFor(n, grain = 64) { v =>
      var bestB = -1
      var best = Double.NegativeInfinity
      for (b <- byVertex(v)) {
        val x = chiPrime(v, b, bub, g, s)
        if (x > best || (x == best && b > bestB)) { best = x; bestB = b }
      }
      bubbleOf(v) = bestB
    }

    Assignments(group, bubbleOf, conv)
  }

  /** A merge inside one group's plan, with local node numbering:
    * 0..m-1 = index into the group's member array, m+t = t-th local
    * merge. `kind` 0 = intra-bubble, 1 = inter-bubble.
    */
  final case class LocalMerge(a: Int, b: Int, dist: Double, kind: Int, bubbleOrd: Int)

  /** Pure per-group dendrogram plan: serializable, so the group fan-out
    * can run on a thread pool or on a Spark RDD.
    */
  final case class GroupPlan(members: Array[Int], merges: Array[LocalMerge])

  /** Plan one group's intra-bubble + inter-bubble complete linkage. */
  def planGroup(members: Array[Int], bubbleOf: Array[Int], apspD: SymMatrix): GroupPlan = {
    val m = members.length
    val memberIdx = members.zipWithIndex.toMap
    if (m == 1) GroupPlan(members, Array.empty)
    else {
      val bubbleIds = members.map(bubbleOf).distinct.sorted
      val subgroups = bubbleIds.map(b => members.filter(v => bubbleOf(v) == b))
      val merges = new ArrayBuffer[LocalMerge]()
      var nextLocal = m
      val subRootLocal = new Array[Int](subgroups.length)
      // intra-bubble complete linkage per subgroup
      for ((sg, ord) <- subgroups.zipWithIndex) {
        if (sg.length == 1) subRootLocal(ord) = memberIdx(sg(0))
        else {
          val k = sg.length
          val dmat = new Array[Double](k * k)
          for (i <- 0 until k; j <- i + 1 until k) {
            val dd = apspD(sg(i), sg(j))
            dmat(i * k + j) = dd; dmat(j * k + i) = dd
          }
          val ms = Linkage.agglomerate(k, dmat, Array.fill(k)(1), Linkage.Complete)
          val nodeOf = new Array[Int](2 * k - 1)
          for (i <- 0 until k) nodeOf(i) = memberIdx(sg(i))
          for ((mm, t) <- ms.zipWithIndex) {
            val id = nextLocal; nextLocal += 1
            merges += LocalMerge(nodeOf(mm.a), nodeOf(mm.b), mm.dist, kind = 0, bubbleOrd = ord)
            nodeOf(k + t) = id
          }
          subRootLocal(ord) = nextLocal - 1
        }
      }
      // inter-bubble complete linkage across subgroup roots
      if (subgroups.length > 1) {
        val cd = Linkage.clusterDistances(subgroups, (a, b) => apspD(a, b), Linkage.Complete)
        val ms = Linkage.agglomerate(subgroups.length, cd,
          subgroups.map(_.length), Linkage.Complete)
        val nodeOf = new Array[Int](2 * subgroups.length - 1)
        for (i <- subgroups.indices) nodeOf(i) = subRootLocal(i)
        for ((mm, t) <- ms.zipWithIndex) {
          val id = nextLocal; nextLocal += 1
          merges += LocalMerge(nodeOf(mm.a), nodeOf(mm.b), mm.dist, kind = 1, bubbleOrd = 0)
          nodeOf(subgroups.length + t) = id
        }
      }
      GroupPlan(members, merges.toArray)
    }
  }

  /** Build the DBHT dendrogram (Algorithm 4, Lines 24-33 plus the height
    * re-assignment of §V-D): complete linkage within each subgroup
    * (group x bubble), then across subgroups within a group, then across
    * groups, with heights 1/(n_b-1)..1 inside each group and
    * #converging-bubbles-in-descendants at the top level.
    */
  def dendrogram(n: Int, asg: Assignments, apspD: SymMatrix, par: Par): Dendrogram = {
    val groups = asg.group.distinct.sorted
    val plans: Array[GroupPlan] = par.parMap(groups.length) { gi =>
      val bc = groups(gi)
      planGroup((0 until n).filter(asg.group(_) == bc).toArray, asg.bubble, apspD)
    }
    assemble(n, plans, apspD)
  }

  /** Apply group plans to a shared builder and finish with the top-level
    * inter-group complete linkage.
    */
  def assemble(n: Int, plans: Array[GroupPlan], apspD: SymMatrix): Dendrogram = {
    val groups = plans.indices.toArray
    val builder = new DendroBuilder(n)
    val groupRoot = new Array[Int](groups.length)
    for (gi <- groups.indices) {
      val plan = plans(gi)
      val m = plan.members.length
      val globalOf = new Array[Int](m + plan.merges.length)
      for (i <- 0 until m) globalOf(i) = plan.members(i)
      val mergeNode = new Array[Int](plan.merges.length)
      for ((mm, t) <- plan.merges.zipWithIndex) {
        val gid = builder.merge(globalOf(mm.a), globalOf(mm.b), 0.0)
        globalOf(m + t) = gid
        mergeNode(t) = gid
      }
      // heights: sort intra (by bubble order then distance then creation)
      // before inter (by distance then creation); assign 1/(n_b-1) .. 1
      val order = plan.merges.indices.sortBy { t =>
        val mm = plan.merges(t)
        (mm.kind, if (mm.kind == 0) mm.bubbleOrd else 0, mm.dist, t)
      }
      val nb = m
      for ((t, rank) <- order.zipWithIndex)
        builder.setHeight(mergeNode(t), 1.0 / (nb - 1 - rank))
      groupRoot(gi) = if (plan.merges.isEmpty) plan.members(0) else mergeNode.last
    }

    // top level: complete linkage across groups, heights = number of
    // converging bubbles (groups) among descendants
    if (groups.length > 1) {
      val memberSets = plans.map(_.members)
      val cd = Linkage.clusterDistances(memberSets, (a, b) => apspD(a, b), Linkage.Complete)
      val ms = Linkage.agglomerate(groups.length, cd, memberSets.map(_.length), Linkage.Complete)
      val nodeOf  = new Array[Int](2 * groups.length - 1)
      val nGroups = new Array[Int](2 * groups.length - 1)
      for (i <- groups.indices) { nodeOf(i) = groupRoot(i); nGroups(i) = 1 }
      for ((mm, t) <- ms.zipWithIndex) {
        val cnt = nGroups(mm.a) + nGroups(mm.b)
        val gid = builder.merge(nodeOf(mm.a), nodeOf(mm.b), cnt.toDouble)
        nodeOf(groups.length + t) = gid
        nGroups(groups.length + t) = cnt
      }
    }
    builder.build()
  }
}
