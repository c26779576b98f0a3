package repro.detect

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class LinAlgSpec extends AnyFunSuite {

  private def approx(a: Double, b: Double, eps: Double = 1e-6) =
    assert(math.abs(a - b) < eps, s"$a vs $b")

  test("colMeans") {
    val m = LinAlg.colMeans(Array(Array(1.0, 2.0), Array(3.0, 4.0)))
    approx(m(0), 2.0); approx(m(1), 3.0)
  }

  test("covariance of independent columns is diagonal-ish") {
    val rng = new Random(1)
    val rows = Array.fill(5000)(Array(rng.nextGaussian(), rng.nextGaussian()))
    val cov = LinAlg.covariance(rows, LinAlg.colMeans(rows))
    approx(cov(0)(0), 1.0, 0.1)
    approx(cov(1)(1), 1.0, 0.1)
    approx(cov(0)(1), 0.0, 0.1)
  }

  test("covariance is symmetric") {
    val rng = new Random(2)
    val rows = Array.fill(100)(Array.fill(4)(rng.nextDouble()))
    val cov = LinAlg.covariance(rows, LinAlg.colMeans(rows))
    for (i <- 0 until 4; j <- 0 until 4) approx(cov(i)(j), cov(j)(i))
  }

  test("eigen of a diagonal matrix returns the diagonal sorted") {
    val (vals, _) = LinAlg.symmetricEigen(Array(
      Array(1.0, 0.0, 0.0), Array(0.0, 5.0, 0.0), Array(0.0, 0.0, 3.0)))
    approx(vals(0), 5.0); approx(vals(1), 3.0); approx(vals(2), 1.0)
  }

  test("eigen of a known 2x2") {
    // [[2,1],[1,2]] has eigenvalues 3 and 1
    val (vals, vecs) = LinAlg.symmetricEigen(Array(Array(2.0, 1.0), Array(1.0, 2.0)))
    approx(vals(0), 3.0); approx(vals(1), 1.0)
    // eigenvector for 3 is (1,1)/sqrt(2) up to sign
    approx(math.abs(vecs(0)(0)), 1.0 / math.sqrt(2), 1e-6)
    approx(math.abs(vecs(1)(0)), 1.0 / math.sqrt(2), 1e-6)
  }

  test("eigenvectors are orthonormal and reconstruct the matrix") {
    val rng = new Random(3)
    val d = 6
    val base = Array.fill(d, d)(rng.nextGaussian())
    val sym = Array.tabulate(d, d)((i, j) => (base(i)(j) + base(j)(i)) / 2)
    val (vals, vecs) = LinAlg.symmetricEigen(sym)
    // orthonormality
    for (a <- 0 until d; b <- 0 until d) {
      val dot = (0 until d).map(i => vecs(i)(a) * vecs(i)(b)).sum
      approx(dot, if (a == b) 1.0 else 0.0, 1e-8)
    }
    // reconstruction A = V Λ Vᵀ
    for (i <- 0 until d; j <- 0 until d) {
      val rec = (0 until d).map(k => vecs(i)(k) * vals(k) * vecs(j)(k)).sum
      approx(rec, sym(i)(j), 1e-8)
    }
  }

  test("dot and norm2") {
    approx(LinAlg.dot(Array(1.0, 2.0, 3.0), Array(4.0, 5.0, 6.0)), 32.0)
    approx(LinAlg.norm2(Array(3.0, 4.0)), 5.0)
  }

  test("cosineDistance extremes") {
    approx(LinAlg.cosineDistance(Array(1.0, 0.0), Array(2.0, 0.0)), 0.0)
    approx(LinAlg.cosineDistance(Array(1.0, 0.0), Array(0.0, 1.0)), 1.0)
    approx(LinAlg.cosineDistance(Array(0.0, 0.0), Array(0.0, 0.0)), 0.0)
    approx(LinAlg.cosineDistance(Array(0.0, 0.0), Array(1.0, 0.0)), 1.0)
  }
}
