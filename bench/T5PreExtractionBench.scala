package repro.bench

import repro.SparkSpec
import repro.tables.T5PreExtraction

/** T5 at bench scale: structured-payload pre-extraction. */
class T5PreExtractionBench extends SparkSpec {

  test("T5 — pre-extraction of structured payloads (bench scale)") {
    val res = T5PreExtraction.run(spark, nSessions = 2000)
    println(T5PreExtraction.render(res))
    val raw  = res.rows.find(_.condition == "raw message").get
    val core = res.rows.find(_.condition == "pre-extracted").get
    assert(res.payloadTokenShare > 0.15, s"share ${res.payloadTokenShare}")
    assert(core.scores.groupingAccuracy > raw.scores.groupingAccuracy + 0.05)
    // payload values are wildcarded either way, so Eq.1 must not regress
    assert(core.scores.tokenAccuracy >= raw.scores.tokenAccuracy - 0.01)
    assert(core.scores.numTemplates < raw.scores.numTemplates)
    assert(core.scores.groupingAccuracy > 0.9)
  }
}
