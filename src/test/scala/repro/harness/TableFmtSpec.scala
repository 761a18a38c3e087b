package repro.harness

import org.scalatest.funsuite.AnyFunSuite

class TableFmtSpec extends AnyFunSuite {

  test("row pads cells to the given widths") {
    assert(TableFmt.row(Seq("a", "bb"), Seq(3, 4)) == "a   | bb  ")
  }

  test("print renders header, separator, and rows") {
    val out = new java.io.ByteArrayOutputStream()
    Console.withOut(new java.io.PrintStream(out)) {
      TableFmt.print("demo", Seq("x", "yy"), Seq(Seq("1", "2"), Seq("33", "4")))
    }
    val s = out.toString
    assert(s.contains("== demo =="))
    assert(s.contains("x  | yy"))
    assert(s.contains("33 | 4"))
    assert(s.contains("-"))
  }

  test("column widths grow with the longest cell") {
    val out = new java.io.ByteArrayOutputStream()
    Console.withOut(new java.io.PrintStream(out)) {
      TableFmt.print("w", Seq("h"), Seq(Seq("longcell")))
    }
    assert(out.toString.contains("longcell"))
  }

  test("f formats with the requested decimals") {
    assert(TableFmt.f(1.23456, 2) == "1.23")
    assert(TableFmt.f(1.0) == "1.000")
  }

  test("secs appends the unit") {
    assert(TableFmt.secs(0.5) == "0.500s")
  }

  test("experiment thread cap respects the machine") {
    assert(Experiments.maxThreads >= 1 &&
      Experiments.maxThreads <= Runtime.getRuntime.availableProcessors())
  }

  test("registry caps: PMFG and SEQ limits split the registry as intended") {
    assert(Datasets.specs.exists(_.n <= Datasets.pmfgMaxN))
    assert(Datasets.specs.exists(_.n > Datasets.pmfgMaxN))
    assert(Datasets.specs.exists(_.n > Datasets.seqMaxN))
  }

  test("paper ids in the registry are a subset of Table II's ids") {
    val tableII = Set(1, 2, 3, 4, 5, 6, 7, 8, 9, 10, 11, 12, 13, 14, 15, 16, 17, 18)
    assert(Datasets.specs.map(_.id).forall(tableII.contains))
  }
}
