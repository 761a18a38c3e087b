package repro.spark

import repro.{SparkSpec, TestUtils}
import repro.core.{Par, Tmfg}

class SparkTmfgSpec extends SparkSpec {

  test("distributed TMFG equals the kernel TMFG (prefix 1)") {
    val s = TestUtils.randomSim(40, 1)
    val kernel = Par.withThreads(4)(par => Tmfg.build(s, 1, par))
    val dist = SparkTmfg.build(spark, s, 1)
    assert(dist.graph.edges == kernel.graph.edges)
    assert(dist.insertionOrder.sameElements(kernel.insertionOrder))
    assert(dist.rounds == kernel.rounds)
  }

  test("distributed TMFG equals the kernel TMFG (prefix 5)") {
    val s = TestUtils.randomSim(45, 2)
    val kernel = Par.withThreads(4)(par => Tmfg.build(s, 5, par))
    val dist = SparkTmfg.build(spark, s, 5)
    assert(dist.graph.edges == kernel.graph.edges)
    assert(dist.insertionOrder.sameElements(kernel.insertionOrder))
    assert(dist.rounds == kernel.rounds)
  }

  test("distributed bubble tree matches the kernel bubble tree") {
    val s = TestUtils.randomSim(30, 3)
    val kernel = Par.withThreads(2)(par => Tmfg.build(s, 3, par))
    val dist = SparkTmfg.build(spark, s, 3)
    assert(dist.tree.numBubbles == kernel.tree.numBubbles)
    assert(dist.tree.root == kernel.tree.root)
    for (b <- 0 until dist.tree.numBubbles) {
      assert(dist.tree.verts(b).sameElements(kernel.tree.verts(b)))
      assert(dist.tree.parent(b) == kernel.tree.parent(b))
    }
  }

  test("distributed TMFG keeps the structural invariants") {
    val s = TestUtils.randomSim(25, 4)
    val dist = SparkTmfg.build(spark, s, 2)
    assert(dist.graph.numEdges == 3 * 25 - 6)
    assert(repro.pmfg.Planarity.isPlanar(25, dist.graph.edges))
  }
}
