package repro.spark

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.data.TimeSeriesGen.Dataset

/** End-to-end distributed PAR-TDBHT pipeline: RowMatrix correlation ->
  * RDD TMFG -> RDD APSP -> driver assignments (O(n) state) -> RDD
  * fan-out of the per-group complete-linkage plans -> dendrogram.
  *
  * Produces the same dendrogram as the thread-pool kernel pipeline
  * (`repro.harness.Methods.parTdbht`); the kernel carries the runtime
  * experiments, this job demonstrates the distributed-dataflow
  * formulation (see DESIGN.md "Extension-point note").
  */
object SparkPipeline {

  final case class PipelineResult(labels: Array[Int], dendrogram: Dendrogram,
                                  graph: WGraph, rounds: Int)

  /** Distributed per-group dendrogram planning (Algorithm 4 Lines 24-33):
    * groups fan out over an RDD; the APSP matrix ships as a broadcast.
    */
  def dendrogram(spark: SparkSession, n: Int, asg: Dbht.Assignments,
                 apspD: SymMatrix): Dendrogram = {
    val sc = spark.sparkContext
    val groups = asg.group.distinct.sorted
    val memberSets = groups.map(bc => (0 until n).filter(asg.group(_) == bc).toArray)
    val bApsp   = sc.broadcast(apspD.data)
    val bBubble = sc.broadcast(asg.bubble)
    try {
      val plans = sc
        .parallelize(memberSets.toIndexedSeq.zipWithIndex, math.min(64, math.max(1, groups.length)))
        .map { case (members, gi) =>
          (gi, Dbht.planGroup(members, bBubble.value, SymMatrix.wrap(n, bApsp.value)))
        }
        .collect()
        .sortBy(_._1)
        .map(_._2)
      Dbht.assemble(n, plans, apspD)
    } finally {
      bApsp.destroy()
      bBubble.destroy()
    }
  }

  /** Full pipeline from raw series to flat clusters (cut at k). */
  def run(spark: SparkSession, ds: Dataset, prefix: Int, k: Int): PipelineResult = {
    val s = SparkCorrelation.pearson(spark, ds.data)
    val d = Correlation.dissimilarity(s)
    val res  = SparkTmfg.build(spark, s, prefix)
    val apsp = SparkApsp.allPairs(spark, res.graph, d)
    // O(n) assignment state stays on the driver, like the shared-memory
    // algorithm's shared arrays; a Par over local cores drives it
    val (asg, dendro) = Par.default { par =>
      val bub = Dbht.bubblesFromTmfg(res, s, par)
      val a = Dbht.assign(bub, res.graph, s, apsp, par)
      (a, dendrogram(spark, s.n, a, apsp))
    }
    val _ = asg
    PipelineResult(dendro.cut(k), dendro, res.graph, res.rounds)
  }
}
