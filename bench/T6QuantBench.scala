package repro.bench

import repro.SparkSpec
import repro.tables.T6QuantDetection

/** T6 at bench scale: quantitative detection vs token accuracy. */
class T6QuantBench extends SparkSpec {

  test("T6 — quantitative detection tracks Eq.1 token accuracy (bench scale)") {
    val rows = T6QuantDetection.run(spark, nSessions = 8000)
    println(T6QuantDetection.render(rows))
    val oracle = rows.find(_.condition.startsWith("oracle")).get
    val drain  = rows.find(_.condition.startsWith("Drain")).get
    val spell  = rows.find(_.condition.startsWith("Spell")).get
    val noVars = rows.find(_.condition.startsWith("perfect grouping")).get
    assert(oracle.prf.f1 > 0.9, oracle.toString)
    assert(drain.prf.f1 > 0.85, drain.toString)
    assert(drain.tokenAccuracy > spell.tokenAccuracy + 0.1)
    // the paper's claim: without the variable parts identified,
    // quantitative detection is impossible — whatever the grouping
    assert(noVars.prf.f1 < 0.2, noVars.toString)
    assert(noVars.tokenAccuracy < drain.tokenAccuracy)
  }
}
