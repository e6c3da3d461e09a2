package repro.linalg

import org.scalatest.funsuite.AnyFunSuite
import org.scalacheck.{Gen, Prop, Test => SCTest}
import scala.util.Random

/** Unit tests for the local dense kernels backing BKSVD and the
  * reweighting math. ScalaCheck properties are driven through
  * `Prop`/`Test.check` directly (no scalatestplus bridge offline).
  */
class DenseSpec extends AnyFunSuite {

  /** Run a ScalaCheck property and assert it passed. */
  private def checkProp(p: Prop): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(30), p)
    assert(res.passed, res.status.toString)
  }

  private def approx(a: Double, b: Double, tol: Double = 1e-9): Boolean = math.abs(a - b) <= tol

  private def randMat(r: Int, c: Int, seed: Long): Array[Array[Double]] = {
    val rng = new Random(seed)
    Array.fill(r, c)(rng.nextGaussian())
  }

  test("matmul matches hand-computed 2x2") {
    val a = Array(Array(1.0, 2.0), Array(3.0, 4.0))
    val b = Array(Array(5.0, 6.0), Array(7.0, 8.0))
    val c = Dense.matmul(a, b)
    assert(c(0).toSeq == Seq(19.0, 22.0))
    assert(c(1).toSeq == Seq(43.0, 50.0))
  }

  test("matmul with identity is identity") {
    val a = randMat(5, 5, 1)
    val id = Array.tabulate(5, 5)((i, j) => if (i == j) 1.0 else 0.0)
    val c = Dense.matmul(a, id)
    for (i <- 0 until 5; j <- 0 until 5) assert(approx(c(i)(j), a(i)(j)))
  }

  test("matmul rejects mismatched dimensions") {
    intercept[IllegalArgumentException] {
      Dense.matmul(randMat(2, 3, 1), randMat(4, 2, 2))
    }
  }

  test("transpose is an involution") {
    val a = randMat(4, 7, 2)
    val t2 = Dense.transpose(Dense.transpose(a))
    for (i <- 0 until 4; j <- 0 until 7) assert(approx(t2(i)(j), a(i)(j)))
  }

  test("transpose swaps indices") {
    val a = randMat(3, 5, 3)
    val t = Dense.transpose(a)
    for (i <- 0 until 3; j <- 0 until 5) assert(approx(t(j)(i), a(i)(j)))
  }

  test("gram equals AᵀA") {
    val a = randMat(6, 4, 4)
    val g = Dense.gram(a)
    val ref = Dense.matmul(Dense.transpose(a), a)
    for (i <- 0 until 4; j <- 0 until 4) assert(approx(g(i)(j), ref(i)(j)))
  }

  test("gram is symmetric") {
    val g = Dense.gram(randMat(8, 5, 5))
    for (i <- 0 until 5; j <- 0 until 5) assert(approx(g(i)(j), g(j)(i)))
  }

  test("dot and axpy and scale basics") {
    val x = Array(1.0, 2.0, 3.0)
    val y = Array(4.0, 5.0, 6.0)
    assert(approx(Dense.dot(x, y), 32.0))
    assert(Dense.axpy(x, 2.0, y).toSeq == Seq(9.0, 12.0, 15.0))
    assert(Dense.scale(x, -1.0).toSeq == Seq(-1.0, -2.0, -3.0))
  }

  test("eigSym recovers eigenvalues of a diagonal matrix") {
    val d = Array(Array(3.0, 0.0, 0.0), Array(0.0, -1.0, 0.0), Array(0.0, 0.0, 7.0))
    val e = Dense.eigSym(d)
    assert(e.values.toSeq.map(v => math.round(v * 1e9) / 1e9) == Seq(7.0, 3.0, -1.0))
  }

  test("eigSym reconstructs a random symmetric matrix") {
    val b = randMat(6, 6, 7)
    val s = Array.tabulate(6, 6)((i, j) => b(i)(j) + b(j)(i))
    val e = Dense.eigSym(s)
    // S = V Λ Vᵀ
    val lambdaV = Array.tabulate(6, 6)((i, j) => e.vectors(i)(j) * e.values(j))
    val rec = Dense.matmul(lambdaV, Dense.transpose(e.vectors))
    for (i <- 0 until 6; j <- 0 until 6) assert(approx(rec(i)(j), s(i)(j), 1e-7))
  }

  test("eigSym eigenvectors are orthonormal") {
    val b = randMat(5, 5, 8)
    val s = Array.tabulate(5, 5)((i, j) => b(i)(j) + b(j)(i))
    val e = Dense.eigSym(s)
    val vtv = Dense.gram(e.vectors)
    for (i <- 0 until 5; j <- 0 until 5)
      assert(approx(vtv(i)(j), if (i == j) 1.0 else 0.0, 1e-8))
  }

  test("eigSym eigenvalues are sorted descending") {
    val b = randMat(7, 7, 9)
    val s = Array.tabulate(7, 7)((i, j) => b(i)(j) + b(j)(i))
    val vals = Dense.eigSym(s).values
    assert(vals.toSeq == vals.toSeq.sortBy(-(_: Double)))
  }

  test("eigSym trace is preserved (property)") {
    checkProp(Prop.forAll(Gen.choose(2, 8), Gen.choose(0L, 1000L)) { (n: Int, seed: Long) =>
      val b = randMat(n, n, seed)
      val s = Array.tabulate(n, n)((i, j) => b(i)(j) + b(j)(i))
      val trace = (0 until n).map(i => s(i)(i)).sum
      val e = Dense.eigSym(s)
      approx(e.values.sum, trace, 1e-6 * math.max(1.0, math.abs(trace)))
    })
  }

  test("gram positive semidefiniteness (property)") {
    checkProp(Prop.forAll(Gen.choose(2, 10), Gen.choose(1, 5), Gen.choose(0L, 1000L)) {
      (r: Int, c: Int, seed: Long) =>
        val e = Dense.eigSym(Dense.gram(randMat(r, c, seed)))
        e.values.forall(_ > -1e-8)
    })
  }

  test("whitener orthonormalizes a full-rank tall matrix") {
    val b = randMat(20, 4, 10)
    val w = Dense.whitener(Dense.gram(b))
    val q = Dense.matmul(b, w)
    val qtq = Dense.gram(q)
    for (i <- 0 until 4; j <- 0 until 4)
      assert(approx(qtq(i)(j), if (i == j) 1.0 else 0.0, 1e-8))
  }

  test("whitener drops rank-deficient directions") {
    val b0 = randMat(10, 2, 11)
    // third column = sum of first two → rank 2
    val b = b0.map(r => Array(r(0), r(1), r(0) + r(1)))
    val w = Dense.whitener(Dense.gram(b))
    assert(w(0).length == 2)
    val qtq = Dense.gram(Dense.matmul(b, w))
    for (i <- 0 until 2; j <- 0 until 2)
      assert(approx(qtq(i)(j), if (i == j) 1.0 else 0.0, 1e-8))
  }

  test("svdSmall reconstructs the input") {
    val a = randMat(8, 5, 12)
    val (u, s, v) = Dense.svdSmall(a)
    val us = Array.tabulate(8, s.length)((i, j) => u(i)(j) * s(j))
    val rec = Dense.matmul(us, Dense.transpose(v))
    for (i <- 0 until 8; j <- 0 until 5) assert(approx(rec(i)(j), a(i)(j), 1e-7))
  }

  test("svdSmall singular values are nonnegative and descending") {
    val (_, s, _) = Dense.svdSmall(randMat(9, 6, 13))
    assert(s.forall(_ >= 0))
    assert(s.toSeq == s.toSeq.sortBy(-(_: Double)))
  }

  test("svdSmall U and V are orthonormal") {
    val (u, _, v) = Dense.svdSmall(randMat(10, 4, 14))
    Seq(u, v).foreach { m =>
      val g = Dense.gram(m)
      for (i <- g.indices; j <- g.indices)
        assert(approx(g(i)(j), if (i == j) 1.0 else 0.0, 1e-7))
    }
  }
}
