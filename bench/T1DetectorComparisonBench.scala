package repro.bench

import repro.SparkSpec
import repro.tables.T1DetectorComparison

/** T1 at bench scale (~150k lines): regenerates the detector-comparison
  * table and asserts the paper-expected shape (sequence model wins,
  * PCA precise but low-recall).
  */
class T1DetectorComparisonBench extends SparkSpec {

  test("T1 — detector comparison (bench scale)") {
    val rows = T1DetectorComparison.run(spark, nSessions = 20000)
    println(T1DetectorComparison.render(rows))
    val byName = rows.map(r => r.detector -> r.prf).toMap
    val seq = byName("SequenceModel(DeepLog-like)")
    assert(seq.f1 > 0.9, s"sequence model F1 ${seq.f1}")
    Seq("PCA", "InvariantMining", "LogClustering").foreach { base =>
      assert(seq.f1 >= byName(base).f1, s"$base beat the sequence model")
    }
    // PCA: high precision, recall-limited (the DeepLog-paper shape)
    assert(byName("PCA").precision > 0.8)
    assert(byName("PCA").recall < seq.recall)
  }
}
