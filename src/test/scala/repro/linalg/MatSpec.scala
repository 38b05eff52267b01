package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

class MatSpec extends AnyFunSuite {

  test("zeros creates an all-zero matrix of the right shape") {
    val m = Mat.zeros(2, 3)
    assert(m.rows == 2 && m.cols == 3 && m.data.forall(_ == 0.0))
  }

  test("eye has ones on the diagonal only") {
    val m = Mat.eye(3)
    for (i <- 0 until 3; j <- 0 until 3)
      assert(m(i, j) == (if (i == j) 1.0 else 0.0))
  }

  test("update and apply round-trip") {
    val m = Mat.zeros(2, 2)
    m(1, 0) = 4.5
    assert(m(1, 0) == 4.5 && m(0, 1) == 0.0)
  }

  test("transpose swaps indices") {
    val m = Mat.fromRows(Array(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)))
    val t = m.t
    assert(t.rows == 3 && t.cols == 2)
    for (i <- 0 until 2; j <- 0 until 3) assert(t(j, i) == m(i, j))
  }

  test("double transpose is identity") {
    val m = Mat.fromRows(Array(Array(1.0, 2.0), Array(3.0, 4.0)))
    assert(m.t.t.maxAbsDiff(m) == 0.0)
  }

  test("matrix multiply matches hand computation") {
    val a = Mat.fromRows(Array(Array(1.0, 2.0), Array(3.0, 4.0)))
    val b = Mat.fromRows(Array(Array(5.0, 6.0), Array(7.0, 8.0)))
    val c = a * b
    assert(c(0, 0) == 19.0 && c(0, 1) == 22.0 && c(1, 0) == 43.0 && c(1, 1) == 50.0)
  }

  test("identity is the multiplicative unit") {
    val a = Mat.fromRows(Array(Array(2.0, -1.0), Array(0.5, 3.0)))
    assert((Mat.eye(2) * a).maxAbsDiff(a) < 1e-12)
    assert((a * Mat.eye(2)).maxAbsDiff(a) < 1e-12)
  }

  test("applyTo multiplies a float vector") {
    val a = Mat.fromRows(Array(Array(1.0, 2.0), Array(3.0, 4.0)))
    val y = a.applyTo(Array(1f, 1f))
    assert(y.toSeq == Seq(3f, 7f))
  }

  test("copy is independent of the original") {
    val a = Mat.eye(2)
    val b = a.copy
    b(0, 0) = 9.0
    assert(a(0, 0) == 1.0)
  }

  test("shape mismatch in multiply is rejected") {
    intercept[IllegalArgumentException](Mat.zeros(2, 3) * Mat.zeros(2, 3))
  }

  test("maxAbsDiff reports the largest elementwise gap") {
    val a = Mat.eye(2)
    val b = a.copy
    b(1, 0) = 0.25
    assert(Mat.eye(2).maxAbsDiff(b) == 0.25)
  }
}
