package repro.cluster

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Ari, Par}
import scala.util.Random

class SpectralSpec extends AnyFunSuite {

  test("knn graph is symmetric and has at least beta neighbors per node") {
    val rng = new Random(1)
    val pts = Array.fill(40)(Array.fill(3)(rng.nextGaussian()))
    Par.withThreads(2) { par =>
      val adj = Spectral.knnGraph(pts, 5, par)
      for (i <- adj.indices) {
        assert(adj(i).length >= 5)
        for (j <- adj(i)) assert(adj(j).contains(i), s"edge $i-$j not symmetric")
      }
    }
  }

  test("knn graph excludes self-edges") {
    val rng = new Random(2)
    val pts = Array.fill(20)(Array.fill(2)(rng.nextGaussian()))
    Par.withThreads(2) { par =>
      val adj = Spectral.knnGraph(pts, 3, par)
      for (i <- adj.indices) assert(!adj(i).contains(i))
    }
  }

  test("beta larger than n-1 is clamped") {
    val rng = new Random(3)
    val pts = Array.fill(10)(Array.fill(2)(rng.nextGaussian()))
    Par.withThreads(1) { par =>
      val adj = Spectral.knnGraph(pts, 100, par)
      assert(adj.forall(_.length == 9))
    }
  }

  test("embedding separates two well-separated blobs") {
    val rng = new Random(4)
    val pts = Array.tabulate(60) { i =>
      val c = if (i < 30) 0.0 else 20.0
      Array.fill(4)(rng.nextGaussian() + c)
    }
    val truth = Array.tabulate(60)(i => if (i < 30) 0 else 1)
    Par.withThreads(4) { par =>
      val emb = Spectral.embed(pts, 8, 2, par)
      val labels = KMeans.fit(emb, 2, par).labels
      assert(Ari.ari(labels, truth) == 1.0)
    }
  }

  test("embedding has the requested dimensionality and unit-norm columns") {
    val rng = new Random(5)
    val pts = Array.fill(30)(Array.fill(3)(rng.nextGaussian()))
    Par.withThreads(2) { par =>
      val emb = Spectral.embed(pts, 5, 3, par)
      assert(emb.length == 30 && emb.forall(_.length == 3))
      for (c <- 0 until 3) {
        val norm = math.sqrt(emb.map(r => r(c) * r(c)).sum)
        assert(math.abs(norm - 1.0) < 1e-6, s"column $c norm $norm")
      }
    }
  }

  test("embedding is deterministic") {
    val rng = new Random(6)
    val pts = Array.fill(25)(Array.fill(3)(rng.nextGaussian()))
    Par.withThreads(2) { par =>
      val a = Spectral.embed(pts, 4, 2, par)
      val b = Spectral.embed(pts, 4, 2, par)
      assert(a.flatten[Double].sameElements(b.flatten[Double]))
    }
  }
}
