package repro.logs

import org.apache.spark.sql.functions._
import scala.util.Random

import repro.{Oracle, SparkSpec}
import repro.logs.LogModel._
import repro.logs.LogSynth.SynthConfig
import repro.parse.Preprocess

class LogSynthSpec extends SparkSpec {

  import spark.implicits._

  private val smallCfg = SynthConfig(Seq("network", "storage"), nSessions = 200,
                                     anomalyRate = 0.1, seed = 1L)

  test("generation is deterministic in (seed, config)") {
    val a = LogSynth.generate(spark, smallCfg).collect().sortBy(_.lineId)
    val b = LogSynth.generate(spark, smallCfg).collect().sortBy(_.lineId)
    assert(a.toSeq == b.toSeq)
  }

  test("different seeds give different corpora") {
    val a = LogSynth.generate(spark, smallCfg).collect().map(_.message).toSeq
    val b = LogSynth.generate(spark, smallCfg.copy(seed = 2L)).collect().map(_.message).toSeq
    assert(a != b)
  }

  test("generation is independent of partitioning") {
    val ds = LogSynth.generate(spark, smallCfg)
    val a  = ds.repartition(3).collect().sortBy(_.lineId).toSeq
    val b  = ds.repartition(13).collect().sortBy(_.lineId).toSeq
    assert(a == b)
  }

  test("sources cycle deterministically across sessions") {
    val bySession = LogSynth.generate(spark, smallCfg).collect().groupBy(_.sessionId)
    bySession.foreach { case (sid, lines) =>
      assert(lines.map(_.source).distinct.length == 1)
      assert(sid.startsWith(lines.head.source))
    }
    assert(bySession.keys.count(_.startsWith("network")) == 100)
    assert(bySession.keys.count(_.startsWith("storage")) == 100)
  }

  test("normal sessions follow their flow's template order") {
    val lines = LogSynth.generate(spark,
      SynthConfig(Seq("compute"), 50, anomalyRate = 0.0, seed = 3L)).collect()
    lines.groupBy(_.sessionId).values.foreach { ls =>
      val seq = ls.sortBy(_.seqIndex).map(_.templateId).toSeq
      assert(seq == Seq(30, 31, 32, 33))
    }
  }

  test("repeat steps stay within bounds") {
    val lines = LogSynth.generate(spark,
      SynthConfig(Seq("storage"), 100, anomalyRate = 0.0, seed = 4L)).collect()
    lines.groupBy(_.sessionId).values.foreach { ls =>
      val reps = ls.count(_.templateId == 22)
      assert(reps >= 2 && reps <= 5)
    }
  }

  test("anomaly rate is approximately honored") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("hdfs"), 2000, anomalyRate = 0.1, seed = 5L)).collect()
    val rate = corpus.groupBy(_.sessionId).values
      .count(_.head.sessionLabel != Normal).toDouble / 2000
    assert(rate > 0.06 && rate < 0.14)
  }

  test("anomaly-free corpus has only normal labels") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("hdfs"), 300, anomalyRate = 0.0, seed = 6L)).collect()
    assert(corpus.forall(_.sessionLabel == Normal))
    assert(corpus.forall(!_.anomalous))
  }

  test("sequential sessions deviate from the normal flow") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("compute"), 2000, anomalyRate = 0.3, quantShare = 0.0, seed = 7L))
      .collect()
    val normalSeq = Seq(30, 31, 32, 33)
    corpus.groupBy(_.sessionId).values.foreach { ls =>
      val seq = ls.sortBy(_.seqIndex).map(_.templateId).toSeq
      if (ls.head.sessionLabel == Sequential) assert(seq != normalSeq)
      else assert(seq == normalSeq)
    }
  }

  test("sequential sessions mark exactly one anomalous line") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("hdfs"), 1000, anomalyRate = 0.2, quantShare = 0.0, seed = 8L)).collect()
    corpus.groupBy(_.sessionId).values
      .filter(_.head.sessionLabel == Sequential)
      .foreach(ls => assert(ls.count(_.anomalous) == 1))
  }

  test("quantitative sessions keep the normal flow but blow up one value") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("compute"), 2000, anomalyRate = 0.3, quantShare = 1.0, seed = 9L))
      .collect()
    val quant = corpus.groupBy(_.sessionId).values.filter(_.head.sessionLabel == Quantitative)
    assert(quant.nonEmpty)
    quant.foreach { ls =>
      assert(ls.sortBy(_.seqIndex).map(_.templateId).toSeq == Seq(30, 31, 32, 33))
      val bad = ls.filter(_.anomalous)
      assert(bad.length == 1)
      // the anomalous value is far outside the slot's distribution
      val td   = Flows.allTemplates(bad.head.templateId)
      val slot = td.toks.filter(!_.isInstanceOf[Static]).indexWhere(_.isInstanceOf[NumVar])
      val v    = bad.head.variables(slot).toDouble
      val mean = td.toks.collectFirst { case NumVar(m, _, _) => m }.get
      assert(v > 10 * mean)
    }
  }

  test("message tokens match template arity and variables") {
    val corpus = LogSynth.generate(spark, smallCfg.copy(payloadProb = 0.0)).collect()
    corpus.foreach { l =>
      val msgToks  = Preprocess.tokenize(l.message)
      val tmplToks = Preprocess.tokenize(l.template)
      assert(msgToks.length == tmplToks.length, l.message)
      val vars = tmplToks.indices.filter(i => tmplToks(i) == "<*>").map(msgToks)
      assert(vars == l.variables, l.message)
    }
  }

  test("payload lines carry a parseable trailing JSON block") {
    val corpus = LogSynth.generate(spark,
      SynthConfig(Seq("auth"), 300, anomalyRate = 0.0, payloadProb = 1.0, seed = 10L)).collect()
    val payloadLines = corpus.filter(l => l.templateWithPayload != l.template)
    assert(payloadLines.nonEmpty)
    payloadLines.foreach { l =>
      val (_, payload) = Preprocess.extractStructured(l.message)
      assert(payload.isDefined, l.message)
      val keys = Preprocess.parsePayload(payload.get).map(_._1)
      assert(keys == Flows.allTemplates(l.templateId).payloadKeys)
    }
  }

  test("timestamps are non-decreasing within a session") {
    val corpus = LogSynth.generate(spark, smallCfg).collect()
    corpus.groupBy(_.sessionId).values.foreach { ls =>
      val ts = ls.sortBy(_.seqIndex).map(_.ts.getTime)
      assert(ts.zip(ts.tail).forall { case (a, b) => a <= b })
    }
  }

  test("sessions interleave in time (multi-source stream shape)") {
    val corpus = LogSynth.generate(spark, smallCfg).collect().sortBy(_.ts.getTime)
    // within any 50 consecutive stream lines there are several sessions
    val windowSessions = corpus.take(50).map(_.sessionId).distinct
    assert(windowSessions.length > 3)
  }

  test("lineIds are unique") {
    val corpus = LogSynth.generate(spark, smallCfg).collect()
    assert(corpus.map(_.lineId).distinct.length == corpus.length)
  }

  test("session/template counts agree with a DuckDB oracle") {
    val df = LogSynth.generate(spark,
      SynthConfig(Seq("hdfs"), 100, anomalyRate = 0.1, seed = 11L))
      .toDF().select($"sessionId", $"templateId", $"sessionLabel")
    val sparkAgg = df.groupBy($"sessionId", $"templateId")
      .agg(count("*").cast("long") as "n")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT sessionId, templateId, COUNT(*) AS n FROM lines GROUP BY sessionId, templateId",
      "lines" -> df,
    )
  }

  test("label distribution agrees with a DuckDB oracle") {
    val df = LogSynth.generate(spark,
      SynthConfig(Seq("network"), 300, anomalyRate = 0.2, seed = 12L))
      .toDF().select($"sessionId", $"sessionLabel")
    val sparkAgg = df.distinct().groupBy($"sessionLabel")
      .agg(count("*").cast("long") as "n")
    Oracle.assertEquivalent(
      sparkAgg,
      """SELECT sessionLabel, COUNT(*) AS n
         FROM (SELECT DISTINCT sessionId, sessionLabel FROM lines)
         GROUP BY sessionLabel""",
      "lines" -> df,
    )
  }

  test("instantiate draws values near the slot distribution") {
    val rng = new Random(13)
    val td  = Flows.allTemplates(21) // Allocating <N(64,16)> blocks for volume <vol>
    val draws = (1 to 300).map(_ => LogSynth.instantiate(td, rng, quantAnomaly = false))
    val nums = draws.map(_._2.head.toDouble)
    val mean = nums.sum / nums.size
    assert(mean > 48 && mean < 80)
    draws.foreach { case (msg, vars) =>
      assert(msg.startsWith("Allocating "))
      assert(vars.length == 2)
    }
  }
}
