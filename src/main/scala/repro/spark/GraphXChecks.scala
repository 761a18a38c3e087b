package repro.spark

import org.apache.spark.graphx.{Edge, Graph, VertexId}
import org.apache.spark.sql.SparkSession
import repro.core.{SymMatrix, WGraph}

/** GraphX view of a filtered graph, used as an independent validation
  * substrate: weighted degrees via `aggregateMessages` and connectivity
  * via `connectedComponents` cross-check the hand-rolled kernel
  * implementations that the DBHT direction step depends on.
  */
object GraphXChecks {

  def toGraphX(spark: SparkSession, g: WGraph, w: SymMatrix): Graph[Int, Double] = {
    val sc = spark.sparkContext
    val vertices = sc.parallelize((0 until g.n).map(v => (v.toLong: VertexId, v)))
    val edges = sc.parallelize(g.edges.map { case (u, v) => Edge(u.toLong, v.toLong, w(u, v)) })
    Graph(vertices, edges)
  }

  /** Weighted degree per vertex computed distributively. */
  def weightedDegrees(spark: SparkSession, g: WGraph, w: SymMatrix): Array[Double] = {
    val gx = toGraphX(spark, g, w)
    val msgs = gx.aggregateMessages[Double](
      ctx => { ctx.sendToSrc(ctx.attr); ctx.sendToDst(ctx.attr) },
      _ + _)
    val out = new Array[Double](g.n)
    msgs.collect().foreach { case (vid, d) => out(vid.toInt) = d }
    out
  }

  /** Number of connected components (a TMFG must have exactly one). */
  def numComponents(spark: SparkSession, g: WGraph, w: SymMatrix): Int = {
    val gx = toGraphX(spark, g, w)
    gx.connectedComponents().vertices.map(_._2).distinct().count().toInt
  }
}
