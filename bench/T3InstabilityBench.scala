package repro.bench

import repro.SparkSpec
import repro.tables.T3Instability

/** T3 at bench scale: the LogRobust-protocol instability sweep. */
class T3InstabilityBench extends SparkSpec {

  test("T3 — instability robustness (bench scale)") {
    val rows = T3Instability.run(spark, nSessions = 8000)
    println(T3Instability.render(rows))
    val r0  = rows.find(_.ratio == 0.0).get
    val r20 = rows.find(_.ratio == 0.20).get
    assert(r0.exact.f1 > 0.9, s"clean exact ${r0.exact}")
    assert(r20.exact.f1 < r0.exact.f1 - 0.25,
           s"exact did not collapse: ${r0.exact.f1} -> ${r20.exact.f1}")
    assert(r20.semantic.f1 > r20.exact.f1 + 0.2,
           s"semantic ${r20.semantic.f1} vs exact ${r20.exact.f1}")
    // monotone-ish degradation of the exact pipeline
    val exactF1s = rows.sortBy(_.ratio).map(_.exact.f1)
    assert(exactF1s.head > exactF1s.last)
  }
}
