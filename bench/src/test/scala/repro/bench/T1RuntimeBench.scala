package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T1 (paper Fig. 3): runtimes of all hierarchical methods per dataset.
  * Shape claims reproduced: the quadratic baselines (PMFG-DBHT,
  * SEQ-TDBHT) are much slower than PAR-TDBHT, and COMP/AVG are faster
  * than PAR-TDBHT (DBHT pays for APSP + three-level linkage).
  */
class T1RuntimeBench extends AnyFunSuite {
  test("T1: runtime table and baseline slowdowns") {
    val rows = Experiments.t1()
    assert(rows.nonEmpty)
    // every dataset small enough for the baselines must show them slower
    for (r <- rows) {
      for (seq <- r.seq)
        assert(seq > r.par10, s"dataset ${r.id}: SEQ-TDBHT ($seq) not slower than PAR-TDBHT-10 (${r.par10})")
      for (pm <- r.pmfg)
        assert(pm > r.par1seq, s"dataset ${r.id}: PMFG-DBHT not slower than PAR-TDBHT-1 (1t)")
    }
    // the largest datasets hit the baseline "timeout" caps, like the paper
    assert(rows.exists(_.pmfg.isEmpty))
    assert(rows.exists(_.seq.isEmpty))
  }
}
