package repro.stream

import java.sql.Timestamp

import org.apache.spark.sql.execution.streaming.runtime.MemoryStream

import repro.SparkSpec
import repro.classify.PoolClassifier
import repro.core.MoniLog
import repro.detect.{NGramModel, QuantDetector, SemanticMatcher}
import repro.parse.Drain
import repro.stream.MoniLogPipeline._

class MoniLogPipelineSpec extends SparkSpec {

  import spark.implicits._

  /** Tiny hand-built model bundle around one two-template flow. */
  private lazy val models: Models = {
    val drain = new Drain(4, 0.5)
    val msgs = (1 to 30).flatMap(i => Seq(
      s"task started on node n$i",
      s"task finished after ${40 + i % 5} ms",
    ))
    msgs.foreach(drain.parse)
    val tids = Seq(drain.matchOnly("task started on node n1").get,
                   drain.matchOnly("task finished after 42 ms").get)
    val ngram = new NGramModel(2, 9).fit(Seq.fill(30)(tids))
    val quant = new QuantDetector(6.0)
    (1 to 60).foreach(i => quant.observe(tids(1), Seq(s"${40 + i % 5}")))
    Models(drain,
           new SemanticMatcher(drain.templates.view.mapValues(_.toSeq).toMap),
           ngram, quant, drain.templates)
  }

  private def ts(sec: Int) = new Timestamp(1700000000000L + sec * 1000L)

  private def raw(sec: Int, session: String, msg: String) =
    RawLog(ts(sec), "jobs", session, msg)

  test("parseOne matches a known template and extracts variables") {
    val ev = parseOne(models, raw(1, "s1", "task finished after 41 ms"))
    assert(ev.matchedExact)
    assert(ev.vars == Seq("41"))
  }

  test("parseOne falls back to the semantic matcher on twisted input") {
    val ev = parseOne(models, raw(1, "s1", "task completed after 41 ms"))
    assert(!ev.matchedExact)
    assert(ev.templateId != NovelId)
  }

  test("parseOne labels the genuinely novel as NovelId") {
    val ev = parseOne(models, raw(1, "s1", "utterly different content entirely foreign"))
    assert(ev.templateId == NovelId)
  }

  test("parseOne strips a JSON payload before matching") {
    val ev = parseOne(models, raw(1, "s1",
      """task finished after 44 ms {"req": "r-1", "user": "u9"}"""))
    assert(ev.matchedExact)
    assert(ev.vars == Seq("44"))
  }

  test("sequence groups batch events by window/source/session in order") {
    val parsed = Seq(
      ParsedEvent(ts(1), "jobs", "s1", 0, matchedExact = true, Seq("n1")),
      ParsedEvent(ts(2), "jobs", "s1", 1, matchedExact = true, Seq("42")),
      ParsedEvent(ts(1), "jobs", "s2", 0, matchedExact = true, Seq("n2")),
    ).toDS()
    val rows = sequence(parsed, "10 seconds").collect().sortBy(_.sessionId)
    assert(rows.map(_.sessionId).toSeq == Seq("s1", "s2"))
    assert(rows.head.events.map(_.templateId) == Seq(0, 1))
  }

  test("detectOne passes a normal sequence") {
    val row = SeqRow(ts(0), "jobs", "s1", Seq(
      EventRec(ts(1), 0, Seq("n1")), EventRec(ts(2), 1, Seq("42"))))
    assert(detectOne(models, row).isEmpty)
  }

  test("detectOne flags a sequential break") {
    val row = SeqRow(ts(0), "jobs", "s1", Seq(
      EventRec(ts(1), 1, Seq("42")), EventRec(ts(2), 0, Seq("n1"))))
    val rep = detectOne(models, row)
    assert(rep.exists(_.kind == "sequential"))
  }

  test("detectOne flags an out-of-range value as quantitative") {
    val row = SeqRow(ts(0), "jobs", "s1", Seq(
      EventRec(ts(1), 0, Seq("n1")), EventRec(ts(2), 1, Seq("99999"))))
    val rep = detectOne(models, row)
    assert(rep.exists(_.kind == "quantitative"))
    assert(rep.exists(_.score > 6.0))
  }

  test("detectOne treats a novel template as sequential anomaly") {
    val row = SeqRow(ts(0), "jobs", "s1", Seq(
      EventRec(ts(1), 0, Seq("n1")), EventRec(ts(2), NovelId, Nil)))
    assert(detectOne(models, row).exists(_.kind == "sequential"))
  }

  test("classify stamps pool and criticality from the snapshot") {
    val clf = new PoolClassifier()
    (1 to 5).foreach(_ => clf.observe(PoolClassifier.MoveToPool(
      PoolClassifier.ReportFeatures("jobs", "sequential", Seq(0, 1)), "jobs-team")))
    (1 to 5).foreach(_ => clf.observe(PoolClassifier.SetCriticality(
      PoolClassifier.ReportFeatures("jobs", "sequential", Seq(0, 1)), "jobs-team", "high")))
    val reports = Seq(AnomalyReport(ts(0), "jobs", "s1", "sequential",
                                    Seq(0, 1), Seq(1), 1.0, "", "")).toDS()
    val out = MoniLogPipeline.classify(reports,
      MoniLog.broadcastClassifier(spark, clf)).collect()
    assert(out.head.pool == "jobs-team")
    assert(out.head.criticality == "high")
  }

  test("batch pipeline end-to-end emits only the anomalous session") {
    val raws = Seq(
      raw(1, "ok", "task started on node n7"),
      raw(2, "ok", "task finished after 43 ms"),
      raw(4, "bad", "task finished after 41 ms"),
      raw(5, "bad", "task started on node n2"),
    ).toDS()
    val out = MoniLogPipeline.pipeline(
      raws, MoniLog.broadcastModels(spark, models),
      MoniLog.broadcastClassifier(spark, new PoolClassifier())).collect()
    assert(out.map(_.sessionId).toSeq == Seq("bad"))
  }

  test("streaming end-to-end over MemoryStream emits anomalies after the watermark") {
    implicit val sql = spark.sqlContext
    val mem = MemoryStream[RawLog]
    val query = MoniLogPipeline.runToMemory(
      mem.toDS(), MoniLog.broadcastModels(spark, models),
      MoniLog.broadcastClassifier(spark, new PoolClassifier()),
      queryName = "monilog_test", gap = "10 seconds", watermark = "5 seconds")
    try {
      mem.addData(
        raw(1, "ok", "task started on node n7"),
        raw(2, "ok", "task finished after 43 ms"),
        raw(4, "bad", "task finished after 41 ms"),
        raw(5, "bad", "task started on node n2"),
      )
      query.processAllAvailable()
      // advance event time far past the first window so it closes
      mem.addData(raw(100, "flush", "task started on node n1"))
      query.processAllAvailable()
      val out = spark.table("monilog_test").as[AnomalyReport].collect()
      assert(out.map(_.sessionId).toSeq == Seq("bad"))
      assert(out.head.kind == "sequential")
    } finally query.stop()
  }
}
