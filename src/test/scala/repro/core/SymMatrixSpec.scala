package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtils

class SymMatrixSpec extends AnyFunSuite {

  test("update sets both triangles") {
    val m = SymMatrix.zeros(4)
    m.update(1, 3, 2.5)
    assert(m(1, 3) == 2.5 && m(3, 1) == 2.5)
  }

  test("rowSum sums a full row") {
    val m = SymMatrix.zeros(3)
    m.update(0, 1, 1.0); m.update(0, 2, 2.0); m.update(0, 0, 5.0)
    assert(m.rowSum(0) == 8.0)
    assert(m.rowSum(1) == 1.0)
  }

  test("fromRows round-trips") {
    val rows = Array(Array(1.0, 2.0), Array(2.0, 3.0))
    val m = SymMatrix.fromRows(rows)
    assert(m(0, 0) == 1.0 && m(0, 1) == 2.0 && m(1, 0) == 2.0 && m(1, 1) == 3.0)
  }

  test("fromRows rejects ragged input") {
    intercept[IllegalArgumentException] {
      SymMatrix.fromRows(Array(Array(1.0, 2.0), Array(1.0)))
    }
  }

  test("wrap rejects wrong-size arrays") {
    intercept[IllegalArgumentException](SymMatrix.wrap(3, new Array[Double](8)))
  }

  test("copy is independent of the original") {
    val m = TestUtils.randomSim(5, 1)
    val c = m.copy()
    c.update(0, 1, 99.0)
    assert(m(0, 1) != 99.0)
  }

  test("randomSim generator is symmetric with unit diagonal") {
    val m = TestUtils.randomSim(10, 7)
    for (i <- 0 until 10) assert(m(i, i) == 1.0)
    for (i <- 0 until 10; j <- 0 until 10) assert(m(i, j) == m(j, i))
  }
}
