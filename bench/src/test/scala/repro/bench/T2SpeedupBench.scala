package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T2 (paper Fig. 4): self-relative speedup vs thread count on the
  * largest dataset. Shape claims reproduced: larger prefixes scale
  * better; prefix 1 has limited parallelism.
  */
class T2SpeedupBench extends AnyFunSuite {
  test("T2: speedup table; larger prefix scales better") {
    val rows = Experiments.t2()
    val maxT = rows.map(_.threads).max
    def speedupAtMax(prefix: Int): Double =
      rows.filter(r => r.prefix == prefix && r.threads == maxT).head.speedup
    // the largest prefix must out-scale the exact (prefix-1) algorithm
    assert(speedupAtMax(200) > speedupAtMax(1),
      s"prefix 200 (${speedupAtMax(200)}) should scale better than prefix 1 (${speedupAtMax(1)})")
    // and parallelism must help at all for the big prefix
    assert(speedupAtMax(200) > 1.5)
  }
}
