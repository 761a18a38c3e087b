package repro.spark

import repro.SparkSpec
import repro.core._
import repro.data.TimeSeriesGen

class SparkPipelineSpec extends SparkSpec {

  test("distributed pipeline equals the kernel pipeline end to end") {
    val ds = TimeSeriesGen.make("t", 50, 64, 3, noise = 1.0, seed = 7)
    val dist = SparkPipeline.run(spark, ds, prefix = 3, k = 3)

    val kernelLabels = Par.withThreads(4) { par =>
      val s = Correlation.pearson(ds.data, par)
      val d = Correlation.dissimilarity(s)
      val res = Tmfg.build(s, 3, par)
      val apsp = Apsp.allPairs(res.graph, d, par)
      val bub = Dbht.bubblesFromTmfg(res, s, par)
      val asg = Dbht.assign(bub, res.graph, s, apsp, par)
      Dbht.dendrogram(s.n, asg, apsp, par).cut(3)
    }
    assert(Ari.ari(dist.labels, kernelLabels) == 1.0)
  }

  test("distributed per-group dendrogram planning equals the Par version") {
    val ds = TimeSeriesGen.make("t", 40, 48, 4, noise = 1.0, seed = 8)
    Par.withThreads(4) { par =>
      val s = Correlation.pearson(ds.data, par)
      val d = Correlation.dissimilarity(s)
      val res = Tmfg.build(s, 2, par)
      val apsp = Apsp.allPairs(res.graph, d, par)
      val bub = Dbht.bubblesFromTmfg(res, s, par)
      val asg = Dbht.assign(bub, res.graph, s, apsp, par)
      val kernelDen = Dbht.dendrogram(s.n, asg, apsp, par)
      val sparkDen  = SparkPipeline.dendrogram(spark, s.n, asg, apsp)
      assert(kernelDen.left.sameElements(sparkDen.left))
      assert(kernelDen.right.sameElements(sparkDen.right))
      assert(kernelDen.height.sameElements(sparkDen.height))
    }
  }

  test("pipeline clusters class-structured data far better than chance") {
    val ds = TimeSeriesGen.make("t", 60, 96, 3, noise = 0.7, seed = 9)
    val out = SparkPipeline.run(spark, ds, prefix = 5, k = 3)
    assert(Ari.ari(out.labels, ds.labels) > 0.4)
    assert(out.graph.numEdges == 3 * 60 - 6)
  }
}
