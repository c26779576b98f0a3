package repro.detect

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class PcaDetectorSpec extends AnyFunSuite {

  /** Correlated normal data: x2 ≈ 2·x1, x3 independent noise. */
  private def normalRows(n: Int, rng: Random): Array[Array[Double]] =
    Array.fill(n) {
      val base = 5.0 + rng.nextGaussian()
      Array(base, 2 * base + 0.05 * rng.nextGaussian(), rng.nextGaussian())
    }

  test("normal points stay under the threshold") {
    val rng = new Random(1)
    val pca = new PcaDetector().fit(normalRows(500, rng))
    val fresh = normalRows(200, rng)
    val fp = fresh.count(pca.isAnomaly)
    assert(fp <= 6, s"false positives: $fp") // ≲ threshold quantile tail
  }

  test("breaking the correlation is detected") {
    val rng = new Random(2)
    val pca = new PcaDetector().fit(normalRows(500, rng))
    // x2 no longer 2·x1 — large residual off the principal subspace
    val anomaly = Array(5.0, 30.0, 0.0)
    assert(pca.isAnomaly(anomaly))
  }

  test("spe is near zero on the training mean") {
    val rng = new Random(3)
    val rows = normalRows(300, rng)
    val pca = new PcaDetector().fit(rows)
    val mean = LinAlg.colMeans(rows)
    assert(pca.spe(mean) < pca.fittedThreshold)
  }

  test("scaling along the principal direction is not an anomaly") {
    val rng = new Random(4)
    val pca = new PcaDetector().fit(normalRows(500, rng))
    // stays on the x2 = 2·x1 line: inside the principal subspace
    assert(!pca.isAnomaly(Array(7.0, 14.0, 0.0)))
  }

  test("fit on constant data never flags the constant") {
    val rows = Array.fill(50)(Array(3.0, 1.0))
    val pca = new PcaDetector().fit(rows)
    assert(!pca.isAnomaly(Array(3.0, 1.0)))
  }

  test("fit requires data") {
    intercept[IllegalArgumentException](new PcaDetector().fit(Array.empty))
  }

  test("threshold is positive") {
    val rng = new Random(5)
    val pca = new PcaDetector().fit(normalRows(100, rng))
    assert(pca.fittedThreshold > 0)
  }
}
