package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Correlation, Par}

class TimeSeriesGenSpec extends AnyFunSuite {

  test("dimensions and class count are as requested") {
    val ds = TimeSeriesGen.make("t", n = 60, len = 32, classes = 4, noise = 1.0)
    assert(ds.n == 60 && ds.len == 32 && ds.numClasses == 4)
    assert(ds.labels.forall(l => l >= 0 && l < 4))
  }

  test("classes are balanced within one") {
    val ds = TimeSeriesGen.make("t", n = 100, len = 16, classes = 7, noise = 1.0)
    val counts = ds.labels.groupBy(identity).values.map(_.length)
    assert(counts.max - counts.min <= 1)
  }

  test("deterministic in the seed") {
    val a = TimeSeriesGen.make("t", 30, 20, 3, 1.0, seed = 5)
    val b = TimeSeriesGen.make("t", 30, 20, 3, 1.0, seed = 5)
    assert(a.data.flatten[Double].sameElements(b.data.flatten[Double]))
    assert(a.labels.sameElements(b.labels))
    val c = TimeSeriesGen.make("t", 30, 20, 3, 1.0, seed = 6)
    assert(!a.data.flatten[Double].sameElements(c.data.flatten[Double]))
  }

  test("same-class series correlate more than cross-class series") {
    val ds = TimeSeriesGen.make("t", 60, 128, 3, noise = 0.8, seed = 2)
    Par.withThreads(4) { par =>
      val s = Correlation.pearson(ds.data, par)
      var sameSum = 0.0; var sameN = 0
      var diffSum = 0.0; var diffN = 0
      for (i <- 0 until 60; j <- i + 1 until 60) {
        if (ds.labels(i) == ds.labels(j)) { sameSum += s(i, j); sameN += 1 }
        else { diffSum += s(i, j); diffN += 1 }
      }
      assert(sameSum / sameN > diffSum / diffN + 0.2)
    }
  }

  test("noise lowers the intra-class correlation") {
    def meanIntra(noise: Double): Double = {
      val ds = TimeSeriesGen.make("t", 40, 64, 2, noise, seed = 3)
      Par.withThreads(2) { par =>
        val s = Correlation.pearson(ds.data, par)
        val vals = for {
          i <- 0 until 40; j <- i + 1 until 40
          if ds.labels(i) == ds.labels(j)
        } yield s(i, j)
        vals.sum / vals.length
      }
    }
    assert(meanIntra(0.3) > meanIntra(2.0))
  }

  test("stocks: sector structure shows in the correlations") {
    val ds = TimeSeriesGen.stocks(n = 60, sectors = 4, days = 200, seed = 4)
    assert(ds.numClasses == 4)
    Par.withThreads(4) { par =>
      val s = Correlation.pearson(ds.data, par)
      var sameSum = 0.0; var sameN = 0
      var diffSum = 0.0; var diffN = 0
      for (i <- 0 until 60; j <- i + 1 until 60) {
        if (ds.labels(i) == ds.labels(j)) { sameSum += s(i, j); sameN += 1 }
        else { diffSum += s(i, j); diffN += 1 }
      }
      assert(sameSum / sameN > diffSum / diffN)
    }
  }

  test("classes parameter validation") {
    intercept[IllegalArgumentException] {
      TimeSeriesGen.make("t", 5, 10, 6, 1.0)
    }
  }
}
