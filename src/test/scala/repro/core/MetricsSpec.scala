package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Metrics._

class MetricsSpec extends AnyFunSuite {

  test("perfect predictions") {
    val prf = score(Seq((true, true), (false, false), (true, true)))
    assert(prf == PRF(2, 0, 0, 1))
    assert(prf.precision == 1.0 && prf.recall == 1.0 && prf.f1 == 1.0)
  }

  test("all-negative predictions have zero recall") {
    val prf = score(Seq((false, true), (false, false)))
    assert(prf.recall == 0.0)
    assert(prf.f1 == 0.0)
  }

  test("all-positive predictions have full recall, weak precision") {
    val prf = score(Seq((true, true), (true, false), (true, false), (true, false)))
    assert(prf.recall == 1.0)
    assert(math.abs(prf.precision - 0.25) < 1e-9)
  }

  test("empty input yields zeros without dividing by zero") {
    val prf = score(Nil)
    assert(prf.precision == 0.0 && prf.recall == 0.0 && prf.f1 == 0.0)
  }

  test("f1 is the harmonic mean") {
    val prf = PRF(tp = 6, fp = 2, fn = 6, tn = 0)
    // P = 0.75, R = 0.5 → F1 = 0.6
    assert(math.abs(prf.f1 - 0.6) < 1e-9)
  }

  test("counts partition the decision set") {
    val ds = Seq((true, true), (true, false), (false, true), (false, false))
    val prf = score(ds)
    assert(prf.tp + prf.fp + prf.fn + prf.tn == ds.size)
  }
}
