package repro.bench

import repro.SparkSpec
import repro.tables.T8Scalability

/** T8 at bench scale (~320k lines): parsing & end-to-end throughput. */
class T8ScalabilityBench extends SparkSpec {

  test("T8 — parsing and end-to-end throughput (bench scale)") {
    val rows = T8Scalability.run(spark, nSessions = 40000)
    println(T8Scalability.render(rows))
    rows.foreach(r => assert(r.linesPerSec > 0, r.toString))
    def lps(c: String) = rows.find(_.config == c).get.linesPerSec
    // more partitions must not slow the distributed parser down
    assert(lps("DistributedDrain p=16") > lps("DistributedDrain p=1"),
           "p=16 should beat p=1")
    // the full dataflow keeps a real-time-capable rate on a laptop-scale box
    assert(lps("MoniLog end-to-end (batch)") > 5000,
           s"end-to-end ${lps("MoniLog end-to-end (batch)")} lines/s")
  }
}
