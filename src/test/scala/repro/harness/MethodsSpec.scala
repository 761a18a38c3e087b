package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Ari, Linkage, Par}
import repro.data.TimeSeriesGen

/** Integration tests: every method runner in the harness produces sane
  * clusters and timings on a small class-structured dataset.
  */
class MethodsSpec extends AnyFunSuite {

  private lazy val ds = TimeSeriesGen.make("methods-test", 80, 96, 4, noise = 0.5, seed = 21)
  private lazy val (s, d) = Par.withThreads(4)(par => Methods.correlationInput(ds, par))

  test("parTdbht produces k clusters, positive timings, strong ARI on easy data") {
    Par.withThreads(4) { par =>
      val r = Methods.parTdbht(s, d, prefix = 2, k = 4, par)
      assert(r.labels.distinct.length == 4)
      assert(r.timings.tmfg > 0 && r.timings.apsp > 0 && r.timings.hierarchy > 0)
      assert(r.totalEdgeWeight > 0)
      // sanity band, not a quality claim — bench T6 measures quality
      assert(Ari.ari(r.labels, ds.labels) > 0.25)
    }
  }

  test("parTdbht prefix 1 matches seqTdbht clusters (same algorithm, different substrate)") {
    Par.withThreads(4) { par =>
      val p = Methods.parTdbht(s, d, prefix = 1, k = 4, par)
      val q = Methods.seqTdbht(s, d, k = 4)
      assert(Ari.ari(p.labels, q.labels) == 1.0)
      assert(math.abs(p.totalEdgeWeight - q.totalEdgeWeight) < 1e-9)
    }
  }

  test("pmfgDbht runs and clusters the easy data") {
    val r = Methods.pmfgDbht(s, d, k = 4)
    assert(r.labels.distinct.length == 4)
    assert(Ari.ari(r.labels, ds.labels) > 0.3)
  }

  test("PMFG edge weight >= TMFG edge weight on correlation input") {
    Par.withThreads(4) { par =>
      val t = Methods.parTdbht(s, d, prefix = 1, k = 4, par)
      val p = Methods.pmfgDbht(s, d, k = 4)
      assert(p.totalEdgeWeight >= t.totalEdgeWeight - 1e-9)
    }
  }

  test("COMP and AVG baselines run and produce k clusters") {
    for (m <- Seq[Linkage.Method](Linkage.Complete, Linkage.Average)) {
      val r = Methods.hacBaseline(d, k = 4, m)
      assert(r.labels.distinct.length == 4)
      assert(r.timings.hierarchy > 0)
    }
  }

  test("k-means baseline beats chance on the easy data") {
    Par.withThreads(4) { par =>
      val (labels, t) = Methods.kmeans(ds.data, 4, par)
      assert(t > 0 && labels.distinct.length <= 4)
      assert(Ari.ari(labels, ds.labels) > 0.3)
    }
  }

  test("spectral k-means baseline runs") {
    Par.withThreads(4) { par =>
      val (labels, t) = Methods.kmeansSpectral(ds.data, 4, beta = 10, par)
      assert(t > 0 && labels.length == 80)
    }
  }

  test("timings decomposition sums to total") {
    Par.withThreads(2) { par =>
      val r = Methods.parTdbht(s, d, prefix = 3, k = 4, par)
      val tt = r.timings
      assert(math.abs(tt.total - (tt.tmfg + tt.apsp + tt.bubble + tt.hierarchy)) < 1e-12)
    }
  }

  test("dataset registry generates the declared shapes") {
    for (spec <- Datasets.specs.take(3)) {
      val gen = spec.generate()
      assert(gen.n == spec.n && gen.len == spec.len && gen.numClasses == spec.classes)
    }
  }

  test("registry ids are unique and look ups work") {
    assert(Datasets.specs.map(_.id).distinct.length == Datasets.specs.length)
    assert(Datasets.byId(6).name == "ecg5000-like")
    intercept[RuntimeException](Datasets.byId(999))
  }
}
