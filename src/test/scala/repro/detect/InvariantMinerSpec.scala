package repro.detect

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class InvariantMinerSpec extends AnyFunSuite {

  test("mines x_i == x_j from paired events") {
    val rng = new Random(1)
    val rows = Array.fill(200) { val n = 1.0 + rng.nextInt(5); Array(n, n) }
    val im = new InvariantMiner().fit(rows)
    assert(im.fitted.exists(inv => inv.p == 1 && inv.q == 1))
  }

  test("mines 3·x_i == x_j (replication factor)") {
    val rng = new Random(2)
    val rows = Array.fill(200) { val n = 1.0 + rng.nextInt(4); Array(n, 3 * n) }
    val im = new InvariantMiner().fit(rows)
    assert(im.fitted.contains(im.Invariant(0, 1, 3, 1)))
  }

  test("no invariant between independent counts") {
    val rng = new Random(3)
    val rows = Array.fill(300)(Array(1.0 + rng.nextInt(10), 1.0 + rng.nextInt(10)))
    val im = new InvariantMiner().fit(rows)
    assert(im.fitted.isEmpty)
  }

  test("violation of a mined invariant is an anomaly") {
    val rows = Array.fill(100)(Array(2.0, 2.0))
    val im = new InvariantMiner().fit(rows)
    assert(im.isAnomaly(Array(2.0, 5.0)))
    assert(!im.isAnomaly(Array(4.0, 4.0)))
  }

  test("violations lists the broken invariant") {
    val rows = Array.fill(100)(Array(1.0, 2.0))
    val im = new InvariantMiner().fit(rows) // 2·x0 == x1
    val v = im.violations(Array(1.0, 5.0))
    assert(v.nonEmpty)
    assert(v.forall(inv => inv.p * 1.0 != inv.q * 5.0))
  }

  test("support below threshold rejects noisy invariants") {
    val rng = new Random(4)
    // equality holds only 80% of the time < default 98% support
    val rows = Array.fill(300) {
      val n = 1.0 + rng.nextInt(5)
      if (rng.nextDouble() < 0.8) Array(n, n) else Array(n, n + 1)
    }
    val im = new InvariantMiner().fit(rows)
    assert(!im.fitted.exists(inv => inv.i == 0 && inv.j == 1 && inv.p == 1 && inv.q == 1))
  }

  test("coefficients are coprime") {
    val rows = Array.fill(100) { Array(2.0, 4.0) }
    val im = new InvariantMiner().fit(rows)
    im.fitted.foreach { inv =>
      def gcd(a: Int, b: Int): Int = if (b == 0) a else gcd(b, a % b)
      assert(gcd(inv.p, inv.q) == 1)
    }
  }

  test("fit requires data") {
    intercept[IllegalArgumentException](new InvariantMiner().fit(Array.empty))
  }

  test("hdfs-like session vectors: open/close invariant catches a drop") {
    val rng = new Random(5)
    // [allocate, receiving, received(xk), terminating]: allocate==receiving==terminating
    val rows = Array.fill(300) {
      val k = 2.0 + rng.nextInt(2)
      Array(1.0, 1.0, k, 1.0)
    }
    val im = new InvariantMiner().fit(rows)
    assert(im.isAnomaly(Array(1.0, 0.0, 3.0, 1.0))) // dropped "receiving"
    assert(!im.isAnomaly(Array(1.0, 1.0, 2.0, 1.0)))
  }
}
