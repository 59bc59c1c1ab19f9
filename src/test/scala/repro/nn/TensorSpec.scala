package repro.nn

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class TensorSpec extends AnyFunSuite {

  test("matmul against hand-computed 2x3 * 3x2") {
    val a = new Tensor(2, 3, Array(1, 2, 3, 4, 5, 6).map(_.toDouble))
    val b = new Tensor(3, 2, Array(7, 8, 9, 10, 11, 12).map(_.toDouble))
    val c = a mm b
    assert(c.rows == 2 && c.cols == 2)
    assert(c(0, 0) == 58.0 && c(0, 1) == 64.0 && c(1, 0) == 139.0 && c(1, 1) == 154.0)
  }

  test("matmul shape mismatch throws") {
    val a = Tensor.zeros(2, 3)
    intercept[IllegalArgumentException](a mm Tensor.zeros(2, 2))
  }

  test("transpose round-trips") {
    val rng = new Random(1)
    val a = Tensor.glorot(4, 7, rng)
    val tt = a.t.t
    assert(tt.rows == a.rows && tt.cols == a.cols)
    assert(tt.data.sameElements(a.data))
  }

  test("transpose swaps indices") {
    val a = new Tensor(2, 3, Array(1, 2, 3, 4, 5, 6).map(_.toDouble))
    val t = a.t
    assert(t(2, 1) == a(1, 2) && t(0, 1) == a(1, 0))
  }

  test("addRow broadcasts bias over rows") {
    val a = Tensor.zeros(3, 2)
    val b = Tensor.rowVec(Array(1.0, 2.0))
    val c = a.addRow(b)
    (0 until 3).foreach(r => assert(c(r, 0) == 1.0 && c(r, 1) == 2.0))
  }

  test("hadamard and scalar ops") {
    val a = new Tensor(1, 3, Array(1.0, 2.0, 3.0))
    val b = new Tensor(1, 3, Array(4.0, 5.0, 6.0))
    assert(a.hadamard(b).data.sameElements(Array(4.0, 10.0, 18.0)))
    assert((2.0 *: a).data.sameElements(Array(2.0, 4.0, 6.0)))
    assert((a - b).data.sameElements(Array(-3.0, -3.0, -3.0)))
  }

  test("sum, sumSquares, frobenius") {
    val a = new Tensor(2, 2, Array(1.0, -2.0, 3.0, -4.0))
    assert(a.sum == -2.0)
    assert(a.sumSquares == 30.0)
    assert(math.abs(a.frobenius - math.sqrt(30.0)) < 1e-12)
  }

  test("glorot is deterministic in seed and bounded") {
    val a = Tensor.glorot(5, 5, new Random(42))
    val b = Tensor.glorot(5, 5, new Random(42))
    assert(a.data.sameElements(b.data))
    val limit = math.sqrt(6.0 / 10)
    assert(a.data.forall(x => math.abs(x) <= limit))
  }

  test("fromRows and row round-trip") {
    val rows = Seq(Array(1.0, 2.0), Array(3.0, 4.0), Array(5.0, 6.0))
    val t = Tensor.fromRows(rows)
    assert(t.rows == 3 && t.cols == 2)
    assert(t.row(1).sameElements(Array(3.0, 4.0)))
  }

  test("in-place ops mutate as documented") {
    val a = Tensor.ones(2, 2)
    a.addInPlace(Tensor.ones(2, 2))
    assert(a.data.forall(_ == 2.0))
    a.scaleInPlace(0.5)
    assert(a.data.forall(_ == 1.0))
    a.zeroInPlace()
    assert(a.data.forall(_ == 0.0))
  }
}
