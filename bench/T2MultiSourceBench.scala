package repro.bench

import repro.SparkSpec
import repro.tables.T2MultiSource

/** T2 at bench scale: the multi-source mixing study. */
class T2MultiSourceBench extends SparkSpec {

  test("T2 — multi-source mixing (bench scale)") {
    val rows = T2MultiSource.run(spark, nSessions = 8000)
    println(T2MultiSource.render(rows))
    def prf(det: String, regime: String) =
      rows.find(r => r.detector == det && r.regime == regime).get.prf
    val seq = "SequenceModel(DeepLog-like)"
    assert(prf(seq, "session").f1 > 0.9, s"session ${prf(seq, "session")}")
    // losing per-session structure collapses the sequence model — this
    // is the motivation for MoniLog's structuring step
    assert(prf(seq, "window mixed").f1 < prf(seq, "session").f1 - 0.3)
    assert(prf(seq, "window+src").f1 < prf(seq, "session").f1 - 0.3)
    // counter methods keep their precision on the mixed stream while the
    // sequence model's precision collapses toward the base rate
    assert(prf("PCA", "window mixed").precision >
           prf(seq, "window mixed").precision)
  }
}
