package repro.harness

import repro.core._
import repro.cluster.{KMeans, Spectral}
import repro.data.TimeSeriesGen.Dataset
import repro.pmfg.{GenericBubbles, Pmfg}

/** Method runners for every clustering method in the paper's evaluation,
  * each returning flat labels (dendrogram cut at the ground-truth class
  * count, as the paper does) plus per-step wall-clock timings matching
  * the paper's runtime decomposition (Fig. 5): "tmfg" = filtered-graph
  * construction, "apsp" = all-pairs shortest paths, "bubble" = bubble
  * tree + directions + vertex assignment, "hierarchy" = the three-level
  * complete linkage.
  */
object Methods {

  final case class Timings(tmfg: Double, apsp: Double, bubble: Double, hierarchy: Double) {
    def total: Double = tmfg + apsp + bubble + hierarchy
  }

  final case class RunResult(labels: Array[Int], timings: Timings,
                             dendrogram: Option[Dendrogram], totalEdgeWeight: Double)

  def timed[A](f: => A): (A, Double) = {
    val t0 = System.nanoTime()
    val r  = f
    (r, (System.nanoTime() - t0) / 1e9)
  }

  /** Similarity (Pearson) and dissimilarity (sqrt(2(1-p))) matrices. */
  def correlationInput(ds: Dataset, par: Par): (SymMatrix, SymMatrix) = {
    val s = Correlation.pearson(ds.data, par)
    (s, Correlation.dissimilarity(s))
  }

  /** PAR-TDBHT: the paper's contribution — batched TMFG + optimized DBHT. */
  def parTdbht(s: SymMatrix, d: SymMatrix, prefix: Int, k: Int, par: Par): RunResult = {
    val (res, tTmfg)    = timed(Tmfg.build(s, prefix, par))
    val (apsp, tApsp)   = timed(Apsp.allPairs(res.graph, d, par))
    val (asg, tBubble)  = timed {
      val bub = Dbht.bubblesFromTmfg(res, s, par)
      Dbht.assign(bub, res.graph, s, apsp, par)
    }
    val (dendro, tHier) = timed(Dbht.dendrogram(s.n, asg, apsp, par))
    RunResult(dendro.cut(k), Timings(tTmfg, tApsp, tBubble, tHier),
      Some(dendro), res.graph.totalWeight(s))
  }

  /** SEQ-TDBHT baseline: sequential TMFG (PREFIX=1, 1 thread) and the
    * original quadratic DBHT steps (triangle enumeration + BFS
    * separating tests + BFS directions).
    */
  def seqTdbht(s: SymMatrix, d: SymMatrix, k: Int): RunResult = Par.withThreads(1) { par1 =>
    val (res, tTmfg)  = timed(Tmfg.build(s, 1, par1))
    val (apsp, tApsp) = timed(Apsp.allPairs(res.graph, d, par1))
    val (asg, tBubble) = timed {
      val bub = GenericBubbles.bubbles(res.graph, s)
      Dbht.assign(bub, res.graph, s, apsp, par1)
    }
    val (dendro, tHier) = timed(Dbht.dendrogram(s.n, asg, apsp, par1))
    RunResult(dendro.cut(k), Timings(tTmfg, tApsp, tBubble, tHier),
      Some(dendro), res.graph.totalWeight(s))
  }

  /** PMFG-DBHT baseline: repeated-planarity-test PMFG construction and
    * the original quadratic DBHT.
    */
  def pmfgDbht(s: SymMatrix, d: SymMatrix, k: Int): RunResult = Par.withThreads(1) { par1 =>
    val (g, tPmfg)    = timed(Pmfg.build(s))
    val (apsp, tApsp) = timed(Apsp.allPairs(g, d, par1))
    val (asg, tBubble) = timed {
      val bub = GenericBubbles.bubbles(g, s)
      Dbht.assign(bub, g, s, apsp, par1)
    }
    val (dendro, tHier) = timed(Dbht.dendrogram(s.n, asg, apsp, par1))
    RunResult(dendro.cut(k), Timings(tPmfg, tApsp, tBubble, tHier),
      Some(dendro), g.totalWeight(s))
  }

  /** COMP / AVG baselines: HAC over the full dissimilarity matrix. */
  def hacBaseline(d: SymMatrix, k: Int, method: Linkage.Method): RunResult = {
    val (dendro, t) = timed(Linkage.hac(d, method))
    RunResult(dendro.cut(k), Timings(0, 0, 0, t), Some(dendro), 0.0)
  }

  /** K-MEANS baseline. The series are z-scored first: the UCR archive
    * ships z-normalized series, so the paper's k-means effectively runs
    * on normalized shapes (and the correlation-based methods see
    * normalized input by construction).
    */
  def kmeans(data: Array[Array[Double]], k: Int, par: Par, seed: Long = 42): (Array[Int], Double) = {
    val z = Correlation.zscore(data)
    val (r, t) = timed(KMeans.fit(z, k, par, seed))
    (r.labels, t)
  }

  /** K-MEANS-S baseline: beta-NN spectral embedding to c dims + k-means,
    * over z-scored series (see `kmeans`).
    */
  def kmeansSpectral(data: Array[Array[Double]], k: Int, beta: Int, par: Par,
                     seed: Long = 42): (Array[Int], Double) = {
    val z = Correlation.zscore(data)
    val (labels, t) = timed {
      val emb = Spectral.embed(z, beta, k, par)
      KMeans.fit(emb, k, par, seed).labels
    }
    (labels, t)
  }

  /** Build a TMFG only (for edge-weight and quality sweeps). */
  def tmfgOnly(s: SymMatrix, prefix: Int, par: Par): TmfgResult = Tmfg.build(s, prefix, par)
}
