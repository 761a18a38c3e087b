package repro.spark

import org.apache.spark.mllib.linalg.Vectors
import org.apache.spark.mllib.linalg.distributed.RowMatrix
import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Correlation, SymMatrix}

/** Distributed Pearson-correlation matrix.
  *
  * The n series (rows of the dataset) are z-scored on the driver, then
  * laid out as the *columns* of an L x n RowMatrix whose Gramian
  * Z^T Z — computed by Spark's distributed tree aggregation over the L
  * time points — is exactly the n x n correlation matrix. This is the
  * dataflow version of `repro.core.Correlation.pearson`.
  */
object SparkCorrelation {

  def pearson(spark: SparkSession, rows: Array[Array[Double]]): SymMatrix = {
    val n = rows.length
    val z = Correlation.zscore(rows)
    val len = z(0).length
    // time point t -> vector of the n series' values at t
    val timePoints = spark.sparkContext
      .parallelize(0 until len, math.min(64, len))
      .map(t => Vectors.dense(Array.tabulate(n)(i => z(i)(t))))
    val gram = new RowMatrix(timePoints, len.toLong, n).computeGramianMatrix()
    val m = SymMatrix.zeros(n)
    for (i <- 0 until n; j <- 0 until n) m.data(i * n + j) = gram(i, j)
    // exact 1s on the diagonal (z-scored rows have unit norm up to fp error)
    for (i <- 0 until n) m.data(i * n + i) = 1.0
    m
  }

  /** The same series as a DataFrame of (series, t, value) rows, for the
    * DuckDB-oracle tests (corr() in SQL).
    */
  def seriesDf(spark: SparkSession, rows: Array[Array[Double]]): DataFrame = {
    import spark.implicits._
    rows.zipWithIndex.flatMap { case (r, i) =>
      r.zipWithIndex.map { case (v, t) => (i, t, v) }
    }.toSeq.toDF("series", "t", "value")
  }
}
