package repro.logs

import scala.util.Random

import repro.SparkSpec
import repro.logs.LogSynth.SynthConfig
import repro.parse.Preprocess

class InstabilitySpec extends SparkSpec {

  private def corpus(n: Long = 200) =
    LogSynth.generate(spark, SynthConfig(Seq("network"), n, anomalyRate = 0.0,
                                         payloadProb = 0.0, seed = 20L))

  test("ratio 0 is the identity") {
    val base = corpus().collect().sortBy(_.lineId).toSeq
    val out  = Instability.inject(corpus(), 0.0).collect().sortBy(_.lineId).toSeq
    assert(out == base)
  }

  test("injection is deterministic in seed") {
    val a = Instability.inject(corpus(), 0.2, seed = 9L).collect().sortBy(_.lineId).toSeq
    val b = Instability.inject(corpus(), 0.2, seed = 9L).collect().sortBy(_.lineId).toSeq
    assert(a == b)
  }

  test("roughly the requested ratio of lines is marked unstable") {
    val out = Instability.inject(corpus(1000), 0.2, seed = 3L).collect()
    val base = corpus(1000).collect()
    val touched = out.count(_.unstable).toDouble / base.length
    assert(touched > 0.14 && touched < 0.30, s"touched=$touched")
  }

  test("ground-truth template ids survive every transform") {
    val base = corpus(500).collect().map(l => l.lineId -> l.templateId).toMap
    val out  = Instability.inject(corpus(500), 0.5, seed = 4L).collect()
    out.foreach { l =>
      assert(base(l.lineId & ~(1L << 40)) == l.templateId)
    }
  }

  test("session labels survive every transform") {
    val ds   = LogSynth.generate(spark, SynthConfig(Seq("hdfs"), 300, anomalyRate = 0.2, seed = 5L))
    val base = ds.collect().map(l => l.sessionId -> l.sessionLabel).toMap
    Instability.inject(ds, 0.5, seed = 6L).collect()
      .foreach(l => assert(base(l.sessionId) == l.sessionLabel))
  }

  test("duplication yields two lines with identical message") {
    val out  = Instability.inject(corpus(2000), 0.5, seed = 7L).collect()
    val dups = out.filter(l => (l.lineId & (1L << 40)) != 0)
    assert(dups.nonEmpty)
    val byOrig = out.groupBy(_.lineId & ~(1L << 40))
    dups.foreach { d =>
      val pair = byOrig(d.lineId & ~(1L << 40))
      assert(pair.length == 2)
      assert(pair.map(_.message).distinct.length == 1)
    }
  }

  test("twisted lines differ in exactly one token") {
    val rng = new Random(1)
    val lines = corpus(2000).collect()
    val twisted = lines.flatMap { l =>
      Instability.injectLine(l, 1.0, seed = 8L) match {
        case Seq(one) if one.unstable && one.message != l.message &&
          Preprocess.tokenize(one.message).length == Preprocess.tokenize(l.message).length =>
          Some((l, one))
        case _ => None
      }
    }
    assert(twisted.nonEmpty)
    twisted.take(200).foreach { case (orig, tw) =>
      val a = Preprocess.tokenize(orig.message)
      val b = Preprocess.tokenize(tw.message)
      assert(a.length == b.length)
      assert(a.zip(b).count { case (x, y) => x != y } == 1)
    }
  }

  test("merge transform shortens the message by one token") {
    val lines = corpus(500).collect()
    val merged = lines.flatMap { l =>
      Instability.injectLine(l, 1.0, seed = 11L) match {
        case Seq(one) if one.unstable &&
          Preprocess.tokenize(one.message).length ==
            Preprocess.tokenize(l.message).length - 1 => Some((l, one))
        case _ => None
      }
    }
    assert(merged.nonEmpty)
    merged.foreach { case (orig, m) =>
      assert(m.message.replace(" ", "") == orig.message.replace(" ", ""))
    }
  }

  test("every transformed line keeps its session") {
    val out = Instability.inject(corpus(300), 1.0, seed = 12L).collect()
    val base = corpus(300).collect().map(l => l.lineId -> l.sessionId).toMap
    out.foreach(l => assert(base(l.lineId & ~(1L << 40)) == l.sessionId))
  }
}
