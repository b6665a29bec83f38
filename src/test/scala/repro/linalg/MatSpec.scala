package repro.linalg

import org.scalatest.funsuite.AnyFunSuite

class MatSpec extends AnyFunSuite {

  private val rng = new Rng(123)
  private def randMat(r: Int, c: Int): Mat =
    new Mat(r, c, Array.fill(r * c)(rng.uniform(-2, 2)))

  /** Hand-rolled property loop (no scalatestplus bridge offline). */
  private def forAllDims(f: (Int, Int) => Unit): Unit =
    (0 until 30).foreach { _ => f(1 + rng.nextInt(6), 1 + rng.nextInt(6)) }

  test("zeros has all zero entries") {
    assert(Mat.zeros(3, 4).data.forall(_ == 0.0))
  }

  test("fill sets every entry") {
    assert(Mat.fill(2, 5, 1.5).data.forall(_ == 1.5))
  }

  test("literal constructor is row-major") {
    val m = Mat(2, 2)(1, 2, 3, 4)
    assert(m(0, 0) == 1 && m(0, 1) == 2 && m(1, 0) == 3 && m(1, 1) == 4)
  }

  test("shape mismatch in add throws") {
    intercept[IllegalArgumentException](Mat.zeros(2, 2) + Mat.zeros(2, 3))
  }

  test("add is commutative") {
    forAllDims { (r, c) =>
      val a = randMat(r, c); val b = randMat(r, c)
      assert((a + b).approxEquals(b + a))
    }
  }

  test("sub then add roundtrips") {
    forAllDims { (r, c) =>
      val a = randMat(r, c); val b = randMat(r, c)
      assert(((a - b) + b).approxEquals(a, 1e-9))
    }
  }

  test("elementwise mul matches manual loop") {
    val a = Mat(2, 2)(1, 2, 3, 4); val b = Mat(2, 2)(5, 6, 7, 8)
    assert((a * b).approxEquals(Mat(2, 2)(5, 12, 21, 32)))
  }

  test("scalar mul scales every entry") {
    forAllDims { (r, c) =>
      val a = randMat(r, c)
      assert((a * 2.0).approxEquals(a + a))
    }
  }

  test("matmul identity") {
    val a = randMat(3, 3)
    val id = Mat(3, 3)(1, 0, 0, 0, 1, 0, 0, 0, 1)
    assert((a %*% id).approxEquals(a) && (id %*% a).approxEquals(a))
  }

  test("matmul known values") {
    val a = Mat(2, 3)(1, 2, 3, 4, 5, 6)
    val b = Mat(3, 2)(7, 8, 9, 10, 11, 12)
    assert((a %*% b).approxEquals(Mat(2, 2)(58, 64, 139, 154)))
  }

  test("matmul associativity") {
    val a = randMat(2, 3); val b = randMat(3, 4); val c = randMat(4, 2)
    assert(((a %*% b) %*% c).approxEquals(a %*% (b %*% c), 1e-9))
  }

  test("matmul shape mismatch throws") {
    intercept[IllegalArgumentException](Mat.zeros(2, 3) %*% Mat.zeros(2, 3))
  }

  test("transpose involution") {
    forAllDims { (r, c) => val a = randMat(r, c); assert(a.t.t.approxEquals(a)) }
  }

  test("transpose of product reverses order") {
    val a = randMat(2, 3); val b = randMat(3, 4)
    assert((a %*% b).t.approxEquals(b.t %*% a.t, 1e-9))
  }

  test("addRowVec broadcasts to each row") {
    val a = Mat(2, 3)(1, 1, 1, 2, 2, 2)
    val v = Mat.rowVec(Array(10.0, 20, 30))
    assert(a.addRowVec(v).approxEquals(Mat(2, 3)(11, 21, 31, 12, 22, 32)))
  }

  test("mulColVec broadcasts across columns") {
    val a = Mat(2, 3)(1, 2, 3, 4, 5, 6)
    val v = Mat.colVec(Array(2.0, 10.0))
    assert(a.mulColVec(v).approxEquals(Mat(2, 3)(2, 4, 6, 40, 50, 60)))
  }

  test("sum equals colSum total equals rowSum total") {
    forAllDims { (r, c) =>
      val a = randMat(r, c)
      assert(math.abs(a.sum - a.colSum.sum) < 1e-9)
      assert(math.abs(a.sum - a.rowSum.sum) < 1e-9)
    }
  }

  test("colMean of constant matrix") {
    assert(Mat.fill(4, 3, 2.0).colMean.approxEquals(Mat.fill(1, 3, 2.0)))
  }

  test("hcat preserves both halves") {
    val a = Mat(2, 2)(1, 2, 3, 4); val b = Mat(2, 1)(9, 10)
    val h = a.hcat(b)
    assert(h.cols == 3 && h(0, 2) == 9 && h(1, 2) == 10 && h(1, 1) == 4)
  }

  test("row extracts a single row") {
    val a = Mat(2, 3)(1, 2, 3, 4, 5, 6)
    assert(a.row(1).approxEquals(Mat.rowVec(Array(4.0, 5, 6))))
  }

  test("rowsAt selects and reorders") {
    val a = Mat(3, 2)(1, 2, 3, 4, 5, 6)
    val s = a.rowsAt(Array(2, 0))
    assert(s.approxEquals(Mat(2, 2)(5, 6, 1, 2)))
  }

  test("map applies elementwise") {
    val a = Mat(1, 3)(1, -2, 3)
    assert(a.map(math.abs).approxEquals(Mat(1, 3)(1, 2, 3)))
  }

  test("frobenius norm of known matrix") {
    assert(math.abs(Mat(1, 2)(3, 4).frobenius - 5.0) < 1e-12)
  }

  test("glorot init is within the glorot bound and deterministic in seed") {
    val m1 = Mat.glorot(10, 20, new Rng(5))
    val m2 = Mat.glorot(10, 20, new Rng(5))
    val lim = math.sqrt(6.0 / 30)
    assert(m1.data.forall(x => math.abs(x) <= lim))
    assert(m1.approxEquals(m2))
    assert(m1.data.exists(_ != 0.0))
  }

  test("copy is deep") {
    val a = Mat.zeros(2, 2); val b = a.copy()
    b(0, 0) = 5.0
    assert(a(0, 0) == 0.0)
  }

  test("fromRows builds the expected matrix and rejects ragged input") {
    val m = Mat.fromRows(Seq(Array(1.0, 2), Array(3.0, 4)))
    assert(m.approxEquals(Mat(2, 2)(1, 2, 3, 4)))
    intercept[IllegalArgumentException](Mat.fromRows(Seq(Array(1.0), Array(1.0, 2))))
  }

  test("addInPlace mutates receiver only") {
    val a = Mat.fill(2, 2, 1.0); val b = Mat.fill(2, 2, 2.0)
    a.addInPlace(b)
    assert(a.approxEquals(Mat.fill(2, 2, 3.0)) && b.approxEquals(Mat.fill(2, 2, 2.0)))
  }

  test("distributivity a(b+c) = ab + ac") {
    val a = randMat(3, 4); val b = randMat(4, 2); val c = randMat(4, 2)
    assert((a %*% (b + c)).approxEquals((a %*% b) + (a %*% c), 1e-9))
  }
}
