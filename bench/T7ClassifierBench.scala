package repro.bench

import repro.SparkSpec
import repro.tables.T7Classifier

/** T7 at bench scale: feedback-trained classifier learning curve. */
class T7ClassifierBench extends SparkSpec {

  test("T7 — classifier accuracy vs feedback volume (bench scale)") {
    val rows = T7Classifier.run(spark, nSessions = 20000)
    println(T7Classifier.render(rows))
    val at0   = rows.find(_.feedback == 0).get
    val at50  = rows.find(_.feedback == 50).get
    val at200 = rows.find(_.feedback == 200).get
    assert(at200.poolAccuracy > at0.poolAccuracy + 0.3)
    assert(at200.poolAccuracy > 0.95, at200.toString)
    assert(at200.critAccuracy > 0.95, at200.toString)
    assert(at50.poolAccuracy >= at0.poolAccuracy)
  }
}
