package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T7 (paper Fig. 9): K-MEANS-S quality vs the number of nearest
  * neighbors beta. Shape claim reproduced: quality varies widely with
  * beta on at least some datasets (the paper's point is that beta is
  * hard to choose a priori).
  */
class T7SpectralSensitivityBench extends AnyFunSuite {
  test("T7: beta sensitivity; ARI range is wide on some datasets") {
    val rows = Experiments.t7()
    val ranges = rows.groupBy(_.id).map { case (id, rs) =>
      val aris = rs.map(_.ari)
      (id, aris.max - aris.min)
    }
    assert(ranges.nonEmpty)
    assert(ranges.values.max > 0.1,
      s"no dataset showed beta sensitivity: ranges=$ranges")
  }
}
