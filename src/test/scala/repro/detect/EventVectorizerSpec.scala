package repro.detect

import org.apache.spark.sql.functions._

import repro.{Oracle, SparkSpec}
import repro.logs.LogSynth
import repro.logs.LogSynth.SynthConfig

class EventVectorizerSpec extends SparkSpec {

  import spark.implicits._

  private lazy val corpus = LogSynth.generate(spark,
    SynthConfig(Seq("network", "auth"), 100, anomalyRate = 0.1, seed = 30L)).toDF().cache()

  test("bySession groups every line of a session, in order") {
    val seqs = EventVectorizer.bySession(corpus).collect()
    val byId = corpus.collect().groupBy(_.getAs[String]("sessionId"))
    assert(seqs.length == byId.size)
    seqs.foreach { s =>
      val want = byId(s.key).sortBy(r => (r.getAs[java.sql.Timestamp]("ts").getTime,
                                          r.getAs[Long]("lineId")))
        .map(_.getAs[Int]("templateId")).toSeq
      assert(s.events == want, s.key)
    }
  }

  test("bySession carries the session label") {
    val seqs = EventVectorizer.bySession(corpus).collect()
    val labels = corpus.select("sessionId", "sessionLabel").distinct().collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    seqs.foreach(s => assert(s.label == labels(s.key)))
  }

  test("byWindow perSource keeps sources apart") {
    val seqs = EventVectorizer.byWindow(corpus, "2 seconds", perSource = true).collect()
    seqs.foreach { s =>
      val sources = s.events.map(e => if (e < 40) "network" else "auth").distinct
      assert(sources.size == 1)
    }
  }

  test("byWindow mixed merges sources in one window") {
    val seqs = EventVectorizer.byWindow(corpus, "10 seconds", perSource = false).collect()
    assert(seqs.exists { s =>
      val hasNet = s.events.exists(_ < 40)
      val hasAuth = s.events.exists(_ >= 40)
      hasNet && hasAuth
    })
  }

  test("window aggregation preserves every event exactly once") {
    val seqs = EventVectorizer.byWindow(corpus, "3 seconds", perSource = false).collect()
    assert(seqs.map(_.events.size).sum == corpus.count())
  }

  test("window label is anomalous iff it contains an anomalous session line") {
    val seqs = EventVectorizer.byWindow(corpus, "2 seconds", perSource = true).collect()
    assert(seqs.exists(_.label != "normal") ==
      (corpus.where(col("sessionLabel") =!= "normal").count() > 0))
  }

  test("countVector counts template occurrences") {
    val vocab = Map(10 -> 0, 11 -> 1, 12 -> 2)
    val v = EventVectorizer.countVector(Seq(10, 11, 11, 12, 11), vocab)
    assert(v.toSeq == Seq(1.0, 3.0, 1.0))
  }

  test("countVector ignores out-of-vocabulary events") {
    val vocab = Map(10 -> 0)
    val v = EventVectorizer.countVector(Seq(10, 99, 10), vocab)
    assert(v.toSeq == Seq(2.0))
  }

  test("vocabulary is dense, sorted and stable") {
    val vocab = EventVectorizer.vocabulary(Seq(Seq(5, 3), Seq(3, 9)))
    assert(vocab == Map(3 -> 0, 5 -> 1, 9 -> 2))
  }

  test("hasUnknown") {
    val vocab = Map(1 -> 0, 2 -> 1)
    assert(EventVectorizer.hasUnknown(Seq(1, 7), vocab))
    assert(!EventVectorizer.hasUnknown(Seq(1, 2, 2), vocab))
  }

  test("per-session template counts agree with a DuckDB oracle") {
    val sparkAgg = corpus.groupBy($"sessionId", $"templateId")
      .agg(count("*").cast("long") as "n")
    Oracle.assertEquivalent(
      sparkAgg,
      "SELECT sessionId, templateId, COUNT(*) AS n FROM lines GROUP BY sessionId, templateId",
      "lines" -> corpus.select("sessionId", "templateId"),
    )
  }

  test("2-second tumbling-window counts agree with a DuckDB oracle") {
    val sparkAgg = corpus
      .select((floor(col("ts").cast("long") / 2) * 2) as "bucket", col("source"))
      .groupBy("bucket", "source").agg(count("*").cast("long") as "n")
    val input = corpus.select(col("ts").cast("long") as "epoch", col("source"))
    Oracle.assertEquivalent(
      sparkAgg,
      """SELECT CAST(FLOOR(CAST(epoch AS BIGINT) / 2) * 2 AS BIGINT) AS bucket,
                source, COUNT(*) AS n
         FROM lines GROUP BY 1, 2""",
      "lines" -> input,
    )
  }
}
