package repro.core

import org.scalatest.funsuite.AnyFunSuite

class LayoutSpec extends AnyFunSuite {

  test("basic accessors") {
    val l = Layout(Array(2, 0, 1), Array(4, 8))
    assert(l.d == 3)
    assert(l.sortDim == 1)
    assert(l.gridDims.toSeq == Seq(2, 0))
    assert(l.numCells == 32)
  }

  test("strides: first grid dim most significant") {
    val l = Layout(Array(0, 1, 2, 3), Array(2, 3, 5))
    assert(l.strides.toSeq == Seq(15L, 5L, 1L))
  }

  test("cell ids cover [0, numCells) exactly") {
    val l = Layout(Array(0, 1, 2), Array(3, 4))
    val st = l.strides
    val ids = for (a <- 0 until 3; b <- 0 until 4) yield a * st(0) + b * st(1)
    assert(ids.sorted == (0L until 12L))
  }

  test("single-dimension layout (pure clustered index) has one cell") {
    val l = Layout(Array(0), Array.empty)
    assert(l.numCells == 1)
    assert(l.gridDims.isEmpty)
    assert(l.sortDim == 0)
  }

  test("uniform layout hits the target cell count approximately") {
    val l = Layout.uniform(Array(0, 1, 2, 3), targetCells = 1000)
    assert(l.numCells >= 500 && l.numCells <= 2000)
  }

  test("uniform layout with one dimension") {
    val l = Layout.uniform(Array(0), targetCells = 100)
    assert(l.numCells == 1)
  }

  test("rejects non-permutations") {
    intercept[IllegalArgumentException](Layout(Array(0, 0), Array(2)))
  }

  test("rejects zero columns") {
    intercept[IllegalArgumentException](Layout(Array(0, 1), Array(0)))
  }

  test("rejects arity mismatch") {
    intercept[IllegalArgumentException](Layout(Array(0, 1, 2), Array(2)))
  }
}
