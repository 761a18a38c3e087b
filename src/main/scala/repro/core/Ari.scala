package repro.core

/** Clustering-agreement metrics used in the paper's evaluation (§VII):
  * Adjusted Rand Index (Hubert & Arabie) and Adjusted Mutual Information
  * (Vinh et al.). The paper reports ARI in all plots and notes AMI shows
  * the same trends.
  */
object Ari {

  /** Contingency table between two labelings; labels may be arbitrary ints. */
  def contingency(a: Array[Int], b: Array[Int]): (Array[Array[Long]], Array[Long], Array[Long]) = {
    require(a.length == b.length, s"label arrays differ: ${a.length} vs ${b.length}")
    val aIds = a.distinct.sorted
    val bIds = b.distinct.sorted
    val aIdx = aIds.zipWithIndex.toMap
    val bIdx = bIds.zipWithIndex.toMap
    val table = Array.ofDim[Long](aIds.length, bIds.length)
    for (i <- a.indices) table(aIdx(a(i)))(bIdx(b(i))) += 1
    val rows = table.map(_.sum)
    val cols = bIds.indices.map(j => table.map(_(j)).sum).toArray
    (table, rows, cols)
  }

  @inline private def choose2(x: Long): Double = x.toDouble * (x - 1) / 2.0

  /** Adjusted Rand Index: 1 for identical partitions, ~0 expected for
    * random assignments.
    */
  def ari(a: Array[Int], b: Array[Int]): Double = {
    val (table, rows, cols) = contingency(a, b)
    val n = a.length.toLong
    val sumIj = table.flatten.map(choose2).sum
    val sumI  = rows.map(choose2).sum
    val sumJ  = cols.map(choose2).sum
    val nC2   = choose2(n)
    if (nC2 == 0) return 1.0
    val expected = sumI * sumJ / nC2
    val maxIdx   = (sumI + sumJ) / 2.0
    if (maxIdx == expected) 1.0 // both partitions trivial (all-singletons or single cluster)
    else (sumIj - expected) / (maxIdx - expected)
  }

  private def entropy(counts: Array[Long], n: Long): Double =
    counts.filter(_ > 0).map { c =>
      val p = c.toDouble / n
      -p * math.log(p)
    }.sum

  /** Mutual information of the two labelings (nats). */
  def mutualInformation(a: Array[Int], b: Array[Int]): Double = {
    val (table, rows, cols) = contingency(a, b)
    val n = a.length.toDouble
    var mi = 0.0
    for (i <- table.indices; j <- table(i).indices) {
      val nij = table(i)(j)
      if (nij > 0)
        mi += (nij / n) * math.log(nij * n / (rows(i).toDouble * cols(j)))
    }
    mi
  }

  /** Expected mutual information under the permutation model
    * (Vinh et al. 2010, Eq. 24a) — the hypergeometric sum.
    */
  def expectedMutualInformation(rows: Array[Long], cols: Array[Long], n: Long): Double = {
    val nD = n.toDouble
    // log-factorials up to n
    val logFac = new Array[Double](n.toInt + 1)
    for (i <- 2 to n.toInt) logFac(i) = logFac(i - 1) + math.log(i)
    @inline def lf(x: Long): Double = logFac(x.toInt)
    var emi = 0.0
    for (ai <- rows; bj <- cols) {
      val lo = math.max(1L, ai + bj - n)
      val hi = math.min(ai, bj)
      var nij = lo
      while (nij <= hi) {
        val term1 = nij / nD * math.log(n.toDouble * nij / (ai.toDouble * bj))
        val logP = lf(ai) + lf(bj) + lf(n - ai) + lf(n - bj) -
          (lf(n) + lf(nij) + lf(ai - nij) + lf(bj - nij) + lf(n - ai - bj + nij))
        emi += term1 * math.exp(logP)
        nij += 1
      }
    }
    emi
  }

  /** Adjusted Mutual Information with the arithmetic-mean normalizer
    * (scikit-learn's default `average_method="arithmetic"`).
    */
  def ami(a: Array[Int], b: Array[Int]): Double = {
    val (_, rows, cols) = contingency(a, b)
    val n   = a.length.toLong
    val mi  = mutualInformation(a, b)
    val emi = expectedMutualInformation(rows, cols, n)
    val ha  = entropy(rows, n)
    val hb  = entropy(cols, n)
    val denom = (ha + hb) / 2.0 - emi
    if (math.abs(denom) < 1e-15) 1.0
    else (mi - emi) / denom
  }
}
