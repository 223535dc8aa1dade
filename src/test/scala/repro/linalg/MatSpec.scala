package repro.linalg

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class MatSpec extends AnyFunSuite {

  private def randSpd(n: Int, rng: Random): Mat = {
    // A = B·Bᵀ + n·I is SPD
    val b = new Mat(n, n, Array.fill(n * n)(rng.nextGaussian()))
    val a = b * b.t
    var i = 0
    while (i < n) { a(i, i) += n.toDouble; i += 1 }
    a
  }

  test("multiply matches hand-computed 2x2") {
    val a = new Mat(2, 2, Array(1, 2, 3, 4))
    val b = new Mat(2, 2, Array(5, 6, 7, 8))
    val c = a * b
    assert(c(0, 0) == 19 && c(0, 1) == 22 && c(1, 0) == 43 && c(1, 1) == 50)
  }

  test("matrix-vector multiply") {
    val a = new Mat(2, 3, Array(1, 0, 2, 0, 3, 0))
    val v = a * Array(1.0, 2.0, 3.0)
    assert(v.toSeq == Seq(7.0, 6.0))
  }

  test("transpose round-trips") {
    val a = new Mat(2, 3, Array(1, 2, 3, 4, 5, 6))
    assert(a.t.t.dist(a) == 0.0)
  }

  test("eye is multiplicative identity") {
    val rng = new Random(1)
    val a = new Mat(4, 4, Array.fill(16)(rng.nextGaussian()))
    assert((a * Mat.eye(4)).dist(a) < 1e-12)
    assert((Mat.eye(4) * a).dist(a) < 1e-12)
  }

  test("fromRows rejects ragged input") {
    intercept[IllegalArgumentException] {
      Mat.fromRows(Seq(Array(1.0, 2.0), Array(1.0)))
    }
  }

  test("multiply rejects mismatched dimensions") {
    intercept[IllegalArgumentException] {
      new Mat(2, 3, Array.fill(6)(0.0)) * new Mat(2, 2, Array.fill(4)(0.0))
    }
  }

  test("cholesky reconstructs A = L·Lᵀ on random SPD matrices (20 seeds)") {
    for (seed <- 0 until 20) {
      val rng = new Random(seed)
      val n = 1 + rng.nextInt(12)
      val a = randSpd(n, rng)
      val l = Mat.cholesky(a)
      assert((l * l.t).dist(a) < 1e-8 * n, s"seed=$seed n=$n")
    }
  }

  test("cholesky rejects non-positive-definite matrices") {
    val a = new Mat(2, 2, Array(1.0, 2.0, 2.0, 1.0)) // eigenvalues 3, -1
    intercept[IllegalArgumentException] { Mat.cholesky(a) }
  }

  test("choleskySolve solves A·x = b (20 seeds)") {
    for (seed <- 0 until 20) {
      val rng = new Random(100 + seed)
      val n = 1 + rng.nextInt(10)
      val a = randSpd(n, rng)
      val x = Array.fill(n)(rng.nextGaussian())
      val b = a * x
      val got = Mat.choleskySolve(Mat.cholesky(a), b)
      x.indices.foreach(i => assert(math.abs(got(i) - x(i)) < 1e-7, s"seed=$seed"))
    }
  }

  test("solveLower / solveUpperFromLower agree with direct multiply") {
    val rng = new Random(3)
    val a = randSpd(6, rng)
    val l = Mat.cholesky(a)
    val x = Array.fill(6)(rng.nextGaussian())
    val b = l * x
    val got = Mat.solveLower(l, b)
    x.indices.foreach(i => assert(math.abs(got(i) - x(i)) < 1e-9))
    val bu = l.t * x
    val gotU = Mat.solveUpperFromLower(l, bu)
    x.indices.foreach(i => assert(math.abs(gotU(i) - x(i)) < 1e-9))
  }

  test("jacobiEigSym recovers known eigenvalues of a diagonal matrix") {
    val a = Mat.zeros(3, 3)
    a(0, 0) = 3.0; a(1, 1) = 1.0; a(2, 2) = 2.0
    val (vals, _) = Mat.jacobiEigSym(a)
    assert(vals.toSeq == Seq(3.0, 2.0, 1.0))
  }

  test("jacobiEigSym reconstructs random symmetric matrices (15 seeds)") {
    for (seed <- 0 until 15) {
      val rng = new Random(seed)
      val n = 2 + rng.nextInt(9)
      val b = new Mat(n, n, Array.fill(n * n)(rng.nextGaussian()))
      val a = (b + b.t).scale(0.5)
      val (vals, vecs) = Mat.jacobiEigSym(a)
      val lambda = Mat.zeros(n, n)
      vals.indices.foreach(i => lambda(i, i) = vals(i))
      assert((vecs * lambda * vecs.t).dist(a) < 1e-7 * n, s"seed=$seed n=$n")
    }
  }

  test("jacobiEigSym eigenvalues are sorted descending") {
    val (vals, _) = Mat.jacobiEigSym(randSpd(8, new Random(9)))
    assert(vals.toSeq == vals.toSeq.sorted(Ordering[Double].reverse))
  }

  test("jacobiEigSym eigenvectors are orthonormal") {
    val (_, v) = Mat.jacobiEigSym(randSpd(7, new Random(11)))
    assert((v * v.t).dist(Mat.eye(7)) < 1e-8)
  }

  test("trace of eigenvalues equals trace of matrix") {
    val a = randSpd(6, new Random(21))
    val (vals, _) = Mat.jacobiEigSym(a)
    val tr = (0 until 6).map(i => a(i, i)).sum
    assert(math.abs(vals.sum - tr) < 1e-8)
  }
}
