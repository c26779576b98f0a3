package repro.stream

import java.sql.Timestamp

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import org.apache.spark.sql.streaming.StreamingQuery

import repro.classify.PoolClassifier
import repro.detect.{NGramModel, QuantDetector, SemanticMatcher}
import repro.parse.{Drain, Preprocess, TemplateOps}

/** MoniLog's Figure-1 dataflow as a Structured Streaming job:
  *
  *   multi-source raw stream
  *     → (1) parsing: frozen Drain + semantic matcher for novel templates
  *     → (2) sequence structuring: watermarked tumbling-window aggregation
  *           keyed by (window, source, sessionId)
  *     → (2') detection: sequential (n-gram top-g) + quantitative (value
  *            model) over each structured sequence → anomaly reports
  *     → (3) classification: pool + criticality from the feedback-trained
  *           classifier snapshot
  *
  * Every stage is a pure `DataFrame → DataFrame`/`Dataset` function so
  * batch tests, the streaming job and the benches share one code path.
  */
object MoniLogPipeline {

  /** A raw stream record (the HEADER fields + free-text MESSAGE). */
  final case class RawLog(ts: Timestamp, source: String, sessionId: String, message: String)

  /** Structured event after parsing (step 1 output). */
  final case class ParsedEvent(
      ts: Timestamp,
      source: String,
      sessionId: String,
      templateId: Int,
      matchedExact: Boolean,   // false when the semantic matcher recovered it
      vars: Seq[String],
  )

  /** Template id assigned to messages no component could match. */
  val NovelId: Int = -999

  final case class EventRec(ts: Timestamp, templateId: Int, vars: Seq[String])

  /** One structured sequence (step 2 output). */
  final case class SeqRow(
      windowStart: Timestamp,
      source: String,
      sessionId: String,
      events: Seq[EventRec],
  )

  /** MoniLog's output record: a classified anomaly with criticality. */
  final case class AnomalyReport(
      windowStart: Timestamp,
      source: String,
      sessionId: String,
      kind: String,                // "sequential" | "quantitative"
      events: Seq[Int],
      anomalousIdx: Seq[Int],
      score: Double,
      pool: String,
      criticality: String,
  )

  /** Everything the streaming executors need, trained offline on
    * anomaly-free history (see `MoniLog.train`).
    */
  final case class Models(
      parser: Drain,
      matcher: SemanticMatcher,
      sequential: NGramModel,
      quantitative: QuantDetector,
      templates: Map[Int, Vector[String]],
      zThreshold: Double = 6.0,
  ) extends Serializable

  // ----------------------------------------------------------------
  // step 1 — parsing
  // ----------------------------------------------------------------

  /** Parse one message against the frozen models; pure and reused by the
    * streaming map, batch evaluation and tests.
    */
  def parseOne(models: Models, raw: RawLog): ParsedEvent = {
    val (core, _) = Preprocess.extractStructured(raw.message)
    val tokens    = Preprocess.tokenize(core)
    models.parser.matchTokens(tokens) match {
      case Some(id) =>
        val vars = TemplateOps.extractVars(models.templates(id), tokens)
        ParsedEvent(raw.ts, raw.source, raw.sessionId, id, matchedExact = true, vars)
      case None =>
        models.matcher.mapTemplate(tokens) match {
          case Some(id) =>
            val vars = TemplateOps.extractVars(models.templates(id), tokens)
            ParsedEvent(raw.ts, raw.source, raw.sessionId, id, matchedExact = false, vars)
          case None =>
            ParsedEvent(raw.ts, raw.source, raw.sessionId, NovelId, matchedExact = false, Nil)
        }
    }
  }

  /** Step 1 as a stream transformation. */
  def parseStream(raw: Dataset[RawLog], models: Broadcast[Models]): Dataset[ParsedEvent] = {
    val spark = raw.sparkSession
    import spark.implicits._
    raw.map(r => parseOne(models.value, r))
  }

  // ----------------------------------------------------------------
  // step 2 — sequence structuring (windowed aggregation)
  // ----------------------------------------------------------------

  /** Watermarked session-window aggregation keyed by (source, sessionId);
    * events inside a group are time-ordered. Session windows (gap-based)
    * rather than tumbling windows so an execution flow is never cut at an
    * arbitrary boundary — the structuring MoniLog's detection step needs.
    * Works on both batch and streaming Datasets (append mode emits once
    * the watermark passes a session's close).
    */
  def sequence(parsed: Dataset[ParsedEvent], gap: String = "5 seconds",
               watermark: String = "5 seconds"): Dataset[SeqRow] = {
    val spark = parsed.sparkSession
    import spark.implicits._
    val withWm =
      if (parsed.isStreaming) parsed.withWatermark("ts", watermark) else parsed
    withWm
      .groupBy(session_window(col("ts"), gap) as "w", col("source"), col("sessionId"))
      .agg(sort_array(collect_list(struct(
        col("ts") as "ts", col("templateId") as "templateId", col("vars") as "vars"
      ))) as "events")
      .select(
        col("w.start") as "windowStart",
        col("source"), col("sessionId"), col("events"),
      )
      .as[SeqRow]
  }

  // ----------------------------------------------------------------
  // step 2' — detection
  // ----------------------------------------------------------------

  /** Detect anomalies in one structured sequence. Pure. */
  def detectOne(models: Models, row: SeqRow): Option[AnomalyReport] = {
    val ids    = row.events.map(_.templateId)
    val seqBad = models.sequential.anomalousEvents(ids)
    val quantScores = row.events.zipWithIndex.map { case (e, i) =>
      i -> (if (e.templateId == NovelId) 0.0
            else models.quantitative.score(e.templateId, e.vars))
    }
    val quantBad = quantScores.collect { case (i, z) if z > models.zThreshold => i }
    if (seqBad.isEmpty && quantBad.isEmpty) None
    else {
      val kind  = if (seqBad.nonEmpty) "sequential" else "quantitative"
      val score = if (seqBad.nonEmpty) seqBad.size.toDouble else quantScores.map(_._2).max
      Some(AnomalyReport(row.windowStart, row.source, row.sessionId, kind,
                         ids, (seqBad ++ quantBad).distinct.sorted, score,
                         pool = "", criticality = ""))
    }
  }

  def detect(sequences: Dataset[SeqRow], models: Broadcast[Models]): Dataset[AnomalyReport] = {
    val spark = sequences.sparkSession
    import spark.implicits._
    sequences.flatMap(r => detectOne(models.value, r))
  }

  // ----------------------------------------------------------------
  // step 3 — classification
  // ----------------------------------------------------------------

  /** Attach pool + criticality from a classifier snapshot. */
  def classify(reports: Dataset[AnomalyReport],
               classifier: Broadcast[PoolClassifier]): Dataset[AnomalyReport] = {
    val spark = reports.sparkSession
    import spark.implicits._
    reports.map { r =>
      val (pool, crit) = classifier.value.classify(
        PoolClassifier.ReportFeatures(r.source, r.kind, r.events.distinct))
      r.copy(pool = pool, criticality = crit)
    }
  }

  // ----------------------------------------------------------------
  // end-to-end
  // ----------------------------------------------------------------

  /** Full pipeline over a (possibly streaming) raw Dataset. */
  def pipeline(raw: Dataset[RawLog], models: Broadcast[Models],
               classifier: Broadcast[PoolClassifier],
               gap: String = "5 seconds",
               watermark: String = "5 seconds"): Dataset[AnomalyReport] =
    classify(detect(sequence(parseStream(raw, models), gap, watermark), models),
             classifier)

  /** Launch the streaming query into an in-memory sink (tests / demos). */
  def runToMemory(raw: Dataset[RawLog], models: Broadcast[Models],
                  classifier: Broadcast[PoolClassifier], queryName: String,
                  gap: String = "5 seconds",
                  watermark: String = "5 seconds"): StreamingQuery =
    pipeline(raw, models, classifier, gap, watermark).writeStream
      .format("memory")
      .queryName(queryName)
      .outputMode("append")
      .start()
}
