package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T8 (paper Fig. 10-11 + §VII-B): synthetic stock panel (800 tickers,
  * 11 sectors). The paper reached ARI 0.36 (prefix 30) vs 0.28 (exact
  * TMFG) on 1614 real tickers. Reproduced shape: both configurations
  * recover sector structure far above chance (expected ARI of a random
  * assignment is ~0); which of the two wins is data-dependent (the
  * paper's appendix makes exactly this point), so no direction is
  * asserted — both are recorded in EXPERIMENTS.md.
  */
class T8StockBench extends AnyFunSuite {
  test("T8: stock clustering beats chance under both prefixes") {
    val r = Experiments.t8()
    assert(r.ariPrefix30 > 0.12, s"prefix-30 ARI ${r.ariPrefix30} too weak")
    assert(r.ariPrefix1 > 0.12, s"prefix-1 ARI ${r.ariPrefix1} too weak")
    assert(r.contingency.flatten.sum == 800)
  }
}
