package repro.core

/** Dense symmetric n x n matrix over doubles, stored as a flat row-major
  * array (full square, not triangular — the O(n^2) memory is the point of
  * the paper's input, and full rows give cache-friendly scans in the gain
  * computations and Dijkstra).
  */
final class SymMatrix private (val n: Int, val data: Array[Double]) extends Serializable {

  @inline def apply(i: Int, j: Int): Double = data(i * n + j)

  /** Symmetric update: sets both (i,j) and (j,i). */
  @inline def update(i: Int, j: Int, v: Double): Unit = {
    data(i * n + j) = v
    data(j * n + i) = v
  }

  /** Sum of row i (the weighted degree against every other object). */
  def rowSum(i: Int): Double = {
    var s = 0.0
    var j = 0
    val off = i * n
    while (j < n) { s += data(off + j); j += 1 }
    s
  }

  def copy(): SymMatrix = new SymMatrix(n, data.clone())
}

object SymMatrix {
  def zeros(n: Int): SymMatrix = new SymMatrix(n, new Array[Double](n.toLong.toInt * n))

  /** Wrap an existing flat row-major array (must be length n*n and symmetric). */
  def wrap(n: Int, data: Array[Double]): SymMatrix = {
    require(data.length == n * n, s"expected ${n * n} entries, got ${data.length}")
    new SymMatrix(n, data)
  }

  def fromRows(rows: Array[Array[Double]]): SymMatrix = {
    val n = rows.length
    val m = zeros(n)
    var i = 0
    while (i < n) {
      require(rows(i).length == n, s"row $i has length ${rows(i).length}, expected $n")
      System.arraycopy(rows(i), 0, m.data, i * n, n)
      i += 1
    }
    m
  }
}
