package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Datasets, Experiments}

/** T0: the dataset registry standing in for paper Table II. */
class T0DatasetsBench extends AnyFunSuite {
  test("T0: dataset registry prints and mirrors Table II shapes") {
    Experiments.t0()
    // every stand-in keeps the paper's class count scaling and L where feasible
    for (sp <- Datasets.specs) {
      assert(sp.n <= sp.paperN, s"${sp.name} larger than the paper's dataset")
      assert(sp.classes <= sp.paperClasses)
      val ds = sp.generate()
      assert(ds.n == sp.n && ds.numClasses == sp.classes)
    }
  }
}
