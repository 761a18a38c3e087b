package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T5 (paper Fig. 7 + §VII-B): edge-weight-sum ratios. The paper reports
  * TMFG edge sums at 92.1-100.3% of the PMFG's (97.1%+ for prefix <= 50)
  * on datasets of n >= 930. Our stand-ins are smaller, so a given prefix
  * removes a larger fraction of the sequential decisions; we assert the
  * band at the comparable scale (prefix <= 10) and a looser floor at the
  * extreme prefixes.
  */
class T5EdgeWeightBench extends AnyFunSuite {
  test("T5: edge-weight ratios") {
    val rows = Experiments.t5()
    for (r <- rows) {
      assert(r.ratioVsExact > 0.6 && r.ratioVsExact < 1.02,
        s"dataset ${r.id} prefix ${r.prefix}: ratio vs exact ${r.ratioVsExact}")
      if (r.prefix <= 10)
        assert(r.ratioVsExact > 0.9,
          s"dataset ${r.id} prefix ${r.prefix}: small-prefix ratio ${r.ratioVsExact}")
      for (pm <- r.ratioVsPmfg; if r.prefix <= 10)
        assert(pm > 0.9 && pm < 1.01,
          s"dataset ${r.id} prefix ${r.prefix}: ratio vs PMFG $pm")
    }
    // monotone-ish: the mean ratio falls as prefix grows
    val byPrefix = rows.groupBy(_.prefix).view.mapValues(rs => rs.map(_.ratioVsExact).sum / rs.size)
    assert(byPrefix(2) > byPrefix(200))
  }
}
