package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Ari, Par}
import scala.util.Random

class KMeansSpec extends AnyFunSuite {

  private def blobs(n: Int, k: Int, dim: Int, spread: Double, seed: Long): (Array[Array[Double]], Array[Int]) = {
    val rng = new Random(seed)
    val centers = Array.fill(k)(Array.fill(dim)(rng.nextGaussian() * 10))
    val labels = Array.tabulate(n)(_ % k)
    val data = labels.map(c => centers(c).map(_ + rng.nextGaussian() * spread))
    (data, labels)
  }

  test("recovers well-separated blobs exactly") {
    val (data, truth) = blobs(300, 4, 8, 0.3, 1)
    Par.withThreads(4) { par =>
      val r = KMeans.fit(data, 4, par)
      assert(Ari.ari(r.labels, truth) == 1.0)
    }
  }

  test("cost is non-negative and iterations positive") {
    val (data, _) = blobs(100, 3, 5, 1.0, 2)
    Par.withThreads(2) { par =>
      val r = KMeans.fit(data, 3, par)
      assert(r.cost >= 0 && r.iterations >= 1)
    }
  }

  test("k=1 puts everything in one cluster at the centroid") {
    val (data, _) = blobs(50, 2, 3, 1.0, 3)
    Par.withThreads(2) { par =>
      val r = KMeans.fit(data, 1, par)
      assert(r.labels.forall(_ == 0))
      for (j <- 0 until 3) {
        val mean = data.map(_(j)).sum / data.length
        assert(math.abs(r.centers(0)(j) - mean) < 1e-9)
      }
    }
  }

  test("k=n gives near-zero cost") {
    val (data, _) = blobs(20, 2, 3, 1.0, 4)
    Par.withThreads(2) { par =>
      val r = KMeans.fit(data, 20, par)
      assert(r.cost < 1e-6)
    }
  }

  test("deterministic for a fixed seed") {
    val (data, _) = blobs(150, 3, 4, 1.0, 5)
    Par.withThreads(4) { par =>
      val a = KMeans.fit(data, 3, par, seed = 9)
      val b = KMeans.fit(data, 3, par, seed = 9)
      assert(a.labels.sameElements(b.labels))
    }
  }

  test("result labels lie in [0, k)") {
    val (data, _) = blobs(80, 5, 4, 2.0, 6)
    Par.withThreads(2) { par =>
      val r = KMeans.fit(data, 5, par)
      assert(r.labels.forall(l => l >= 0 && l < 5))
    }
  }

  test("invalid k is rejected") {
    val (data, _) = blobs(10, 2, 2, 1.0, 7)
    Par.withThreads(1) { par =>
      intercept[IllegalArgumentException](KMeans.fit(data, 0, par))
      intercept[IllegalArgumentException](KMeans.fit(data, 11, par))
    }
  }

  test("thread count does not change the result") {
    val (data, _) = blobs(120, 4, 6, 0.8, 8)
    val a = Par.withThreads(1)(par => KMeans.fit(data, 4, par, seed = 3).labels)
    val b = Par.withThreads(8)(par => KMeans.fit(data, 4, par, seed = 3).labels)
    assert(a.sameElements(b))
  }
}
