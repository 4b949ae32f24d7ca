package repro.nn

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.Gen

import repro.PropHelpers

/** Matrix substrate: every op is checked against a naive reference. */
class MatSpec extends AnyFunSuite with PropHelpers {

  private val dims3 = Gen.zip(Gen.choose(1, 17), Gen.choose(1, 17), Gen.choose(1, 17))
  private val dims2 = Gen.zip(Gen.choose(1, 17), Gen.choose(1, 17))

  private def naiveMul(a: Mat, b: Mat): Mat = {
    val out = Mat.zeros(a.rows, b.cols)
    for (i <- 0 until a.rows; j <- 0 until b.cols) {
      var s = 0.0
      for (k <- 0 until a.cols) s += a(i, k).toDouble * b(k, j)
      out(i, j) = s.toFloat
    }
    out
  }

  private def assertClose(a: Mat, b: Mat, tol: Double = 1e-4): Unit = {
    assert(a.rows == b.rows && a.cols == b.cols)
    a.data.indices.foreach { i =>
      assert(math.abs(a.data(i) - b.data(i)) <= tol, s"index $i: ${a.data(i)} vs ${b.data(i)}")
    }
  }

  test("zeros has correct shape and content") {
    val m = Mat.zeros(3, 5)
    assert(m.rows == 3 && m.cols == 5)
    assert(m.data.forall(_ == 0f))
  }

  test("randn is deterministic in seed") {
    val a = Mat.randn(4, 4, seed = 9)
    val b = Mat.randn(4, 4, seed = 9)
    assert(a.data.sameElements(b.data))
    val c = Mat.randn(4, 4, seed = 10)
    assert(!a.data.sameElements(c.data))
  }

  test("randn scale parameter controls magnitude") {
    val small = Mat.randn(100, 100, seed = 1, scale = 0.001)
    assert(small.data.forall(v => math.abs(v) < 0.1))
  }

  test("mul matches naive for fixed case") {
    val a = new Mat(2, 3, Array(1f, 2f, 3f, 4f, 5f, 6f))
    val b = new Mat(3, 2, Array(7f, 8f, 9f, 10f, 11f, 12f))
    val c = Mat.mul(a, b)
    assert(c.data.sameElements(Array(58f, 64f, 139f, 154f)))
  }

  test("mul matches naive on random shapes") {
    forAllN(dims3) { case (m, k, n) =>
      val a = Mat.randn(m, k, seed = m * 100 + k)
      val b = Mat.randn(k, n, seed = k * 100 + n)
      assertClose(Mat.mul(a, b), naiveMul(a, b))
    }
  }

  test("mul parallel path (rows >= threshold) matches naive") {
    val a = Mat.randn(100, 7, seed = 1)
    val b = Mat.randn(7, 5, seed = 2)
    assertClose(Mat.mul(a, b), naiveMul(a, b))
  }

  test("mul rejects shape mismatch") {
    intercept[IllegalArgumentException](Mat.mul(Mat.zeros(2, 3), Mat.zeros(4, 2)))
  }

  test("mulTransB equals A * B^T") {
    forAllN(dims3) { case (m, k, n) =>
      val a = Mat.randn(m, k, seed = 3)
      val b = Mat.randn(n, k, seed = 4)
      val bt = Mat.zeros(k, n)
      for (i <- 0 until n; j <- 0 until k) bt(j, i) = b(i, j)
      assertClose(Mat.mulTransB(a, b), naiveMul(a, bt))
    }
  }

  test("transAmul equals A^T * B") {
    forAllN(dims3) { case (k, m, n) =>
      val a = Mat.randn(k, m, seed = 5)
      val b = Mat.randn(k, n, seed = 6)
      val at = Mat.zeros(m, k)
      for (i <- 0 until k; j <- 0 until m) at(j, i) = a(i, j)
      assertClose(Mat.transAmul(a, b), naiveMul(at, b))
    }
  }

  test("addRowInPlace adds bias to every row") {
    val m = Mat.zeros(3, 2)
    Mat.addRowInPlace(m, Array(1f, -2f))
    for (r <- 0 until 3) { assert(m(r, 0) == 1f); assert(m(r, 1) == -2f) }
  }

  test("reluInPlace clamps negatives only") {
    val m = new Mat(1, 4, Array(-1f, 0f, 2f, -0.5f))
    Mat.reluInPlace(m)
    assert(m.data.sameElements(Array(0f, 0f, 2f, 0f)))
  }

  test("reluBackwardInPlace zeroes gradient where activation <= 0") {
    val act = new Mat(1, 4, Array(0f, 1f, 0f, 3f))
    val g = new Mat(1, 4, Array(5f, 5f, 5f, 5f))
    Mat.reluBackwardInPlace(g, act)
    assert(g.data.sameElements(Array(0f, 5f, 0f, 5f)))
  }

  test("colSum sums columns") {
    val m = new Mat(2, 3, Array(1f, 2f, 3f, 4f, 5f, 6f))
    assert(Mat.colSum(m).sameElements(Array(5f, 7f, 9f)))
  }

  test("softmaxRows rows sum to one and order preserved") {
    forAllN(dims2) { case (m, n) =>
      val x = Mat.randn(m, n, seed = 7, scale = 2.0)
      val s = Mat.softmaxRows(x)
      for (r <- 0 until m) {
        val row = (0 until n).map(c => s(r, c).toDouble)
        assert(math.abs(row.sum - 1.0) < 1e-4)
        assert(row.forall(v => v >= 0 && v <= 1))
        // argmax preserved
        val amx = (0 until n).maxBy(c => x(r, c))
        assert((0 until n).maxBy(c => s(r, c)) == amx)
      }
    }
  }

  test("softmaxRows is numerically stable for large logits") {
    val x = new Mat(1, 3, Array(1000f, 999f, -1000f))
    val s = Mat.softmaxRows(x)
    assert(!s.data.exists(_.isNaN))
    assert(s(0, 0) > s(0, 1) && s(0, 1) > s(0, 2))
  }

  test("argmaxRows picks first maximal index") {
    val m = new Mat(2, 3, Array(1f, 3f, 2f, 0f, 0f, 0f))
    assert(Mat.argmaxRows(m).sameElements(Array(1, 0)))
  }

  test("row extracts a copy") {
    val m = new Mat(2, 2, Array(1f, 2f, 3f, 4f))
    val r = m.row(1)
    assert(r.sameElements(Array(3f, 4f)))
    r(0) = 99f
    assert(m(1, 0) == 3f)
  }

  test("copy is deep") {
    val m = Mat.randn(2, 2, 1)
    val c = m.copy()
    c(0, 0) = 123f
    assert(m(0, 0) != 123f)
  }
}
