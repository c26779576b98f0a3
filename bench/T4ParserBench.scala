package repro.bench

import repro.SparkSpec
import repro.tables.T4ParserBenchTable

/** T4 at bench scale: parser benchmark + Drain sensitivity grid. */
class T4ParserBench extends SparkSpec {

  test("T4a — online parser benchmark (bench scale)") {
    val rows = T4ParserBenchTable.runA(spark, nSessions = 2000)
    println(T4ParserBenchTable.renderA(rows))
    rows.filter(_.parser.startsWith("Drain")).foreach { r =>
      assert(r.scores.groupingAccuracy > 0.9, s"${r.corpus}: ${r.scores}")
      assert(r.scores.tokenAccuracy > 0.85, s"${r.corpus}: ${r.scores}")
    }
    def mixedAcc(p: String) =
      rows.find(r => r.corpus == "mixed" && r.parser.startsWith(p)).get.scores.groupingAccuracy
    assert(mixedAcc("Drain") >= mixedAcc("Spell"), "Drain should lead on the mixed corpus")
    assert(mixedAcc("DistDrain") >= mixedAcc("Drain") - 0.05,
           "distributed Drain should stay close to single-node")
  }

  test("T4b — Drain hyper-parameter sensitivity (bench scale)") {
    val rows = T4ParserBenchTable.runB(spark, nSessions = 2000)
    println(T4ParserBenchTable.renderB(rows))
    val accs = rows.map(_.groupingAccuracy)
    assert(accs.max - accs.min > 0.05,
           s"parameters should matter: spread ${accs.max - accs.min}")
  }
}
