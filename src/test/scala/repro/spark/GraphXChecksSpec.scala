package repro.spark

import repro.{SparkSpec, TestUtils}
import repro.core.{Par, Tmfg}

class GraphXChecksSpec extends SparkSpec {

  test("GraphX weighted degrees equal the kernel weighted degrees") {
    val s = TestUtils.randomSim(30, 5)
    val g = Par.withThreads(2)(par => Tmfg.build(s, 3, par)).graph
    val gx = GraphXChecks.weightedDegrees(spark, g, s)
    val kernel = g.weightedDegrees(s)
    for (v <- 0 until 30)
      assert(math.abs(gx(v) - kernel(v)) < 1e-9, s"vertex $v")
  }

  test("GraphX connected components confirm the TMFG is one component") {
    val s = TestUtils.randomSim(25, 6)
    val g = Par.withThreads(2)(par => Tmfg.build(s, 1, par)).graph
    assert(GraphXChecks.numComponents(spark, g, s) == 1)
  }

  test("GraphX view preserves edge count") {
    val s = TestUtils.randomSim(20, 7)
    val g = Par.withThreads(2)(par => Tmfg.build(s, 2, par)).graph
    val gx = GraphXChecks.toGraphX(spark, g, s)
    assert(gx.numEdges == 3 * 20 - 6)
    assert(gx.numVertices == 20)
  }
}
