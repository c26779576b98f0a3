package repro.core

import org.apache.spark.broadcast.Broadcast
import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._

import repro.classify.PoolClassifier
import repro.detect.{EventVectorizer, NGramModel, QuantDetector, SemanticMatcher}
import repro.parse.{DistributedDrain, Drain, Preprocess, TemplateOps}
import repro.stream.MoniLogPipeline
import repro.stream.MoniLogPipeline.{Models, RawLog}

/** MoniLog facade: offline training on anomaly-free history, producing
  * the frozen model bundle the streaming pipeline broadcasts.
  *
  * Training is itself distributed (the paper's §II scalability
  * requirement): templates are mined with [[DistributedDrain]]; the
  * sequence and value models are fitted from the distributed assignment
  * join; only the compact models live on the driver.
  */
object MoniLog {

  final case class TrainConfig(
      depth: Int = 4,
      simThreshold: Double = 0.5,
      ngramOrder: Int = 2,
      topG: Int = 9,
      zThreshold: Double = 6.0,
      matcherTau: Double = 0.5,
  )

  /** Train the full model bundle from an anomaly-free history.
    *
    * @param history columns `lineId`, `ts`, `source`, `sessionId`,
    *                `message` (ground-truth columns, if present, are
    *                ignored — training is unsupervised)
    */
  def train(spark: SparkSession, history: DataFrame,
            cfg: TrainConfig = TrainConfig()): Models = {
    import spark.implicits._

    // 1. mine templates distributively, over payload-stripped messages
    val core = history.select(
      col("lineId").cast("long") as "lineId",
      col("message").cast("string") as "message",
    ).as[(Long, String)]
      .map { case (id, msg) => (id, Preprocess.extractStructured(msg)._1) }
      .toDF("lineId", "message")
    val mined = DistributedDrain.parse(core, cfg.depth, cfg.simThreshold)

    // 2. frozen matcher tree: replay merged templates into a fresh Drain.
    // Replay may merge further (two mined templates can be mutually
    // similar), so keep an explicit mined-id → frozen-id remap and apply
    // it to the assignments before fitting any model.
    val frozen = new Drain(cfg.depth, cfg.simThreshold)
    val remap: Map[Int, Int] = mined.templates.toSeq.sortBy(_._1).map {
      case (minedId, toks) => minedId -> frozen.parseTokens(toks)
    }.toMap
    val templates = frozen.templates
    val bRemap = spark.sparkContext.broadcast(remap)
    val assignments = mined.assignments
      .select(col("lineId").cast("long") as "lineId", col("templateId").cast("int") as "tid")
      .as[(Long, Int)]
      .map { case (lineId, tid) => (lineId, bRemap.value(tid)) }
      .toDF("lineId", "templateId")

    // 3. per-line structured events for model fitting
    val bTemplates = spark.sparkContext.broadcast(templates)
    val joined = history
      .select(col("lineId").cast("long") as "lineId", col("ts"), col("source"),
              col("sessionId"), col("message").cast("string") as "message")
      .join(assignments, "lineId")
    val events = joined
      .select(col("ts"), col("source"), col("sessionId"), col("message"), col("templateId"))
      .as[(java.sql.Timestamp, String, String, String, Int)]
      .map { case (ts, source, sessionId, message, tid) =>
        val toks = Preprocess.tokenize(Preprocess.extractStructured(message)._1)
        val vars = bTemplates.value.get(tid).map(t => TemplateOps.extractVars(t, toks))
          .getOrElse(Nil)
        (ts, source, sessionId, tid, vars)
      }
      .toDF("ts", "source", "sessionId", "templateId", "vars")
      .persist()

    // 4. sequential model from per-session sequences
    val sequences = EventVectorizer.bySession(
      events.withColumn("lineId", monotonically_increasing_id())
            .withColumn("sessionLabel", lit("normal")))
      .collect().map(_.events)
    val ngram = new NGramModel(cfg.ngramOrder, cfg.topG).fit(sequences.toSeq)

    // 5. value models
    val quant = new QuantDetector(cfg.zThreshold)
    events.select(col("templateId"), col("vars")).as[(Int, Seq[String])]
      .collect().foreach { case (tid, vars) => quant.observe(tid, vars) }
    events.unpersist()

    Models(
      parser = frozen,
      matcher = new SemanticMatcher(templates.view.mapValues(_.toSeq).toMap, cfg.matcherTau),
      sequential = ngram,
      quantitative = quant,
      templates = templates,
      zThreshold = cfg.zThreshold,
    )
  }

  /** Broadcast helpers for driving the pipeline. */
  def broadcastModels(spark: SparkSession, models: Models): Broadcast[Models] =
    spark.sparkContext.broadcast(models)

  def broadcastClassifier(spark: SparkSession,
                          classifier: PoolClassifier): Broadcast[PoolClassifier] =
    spark.sparkContext.broadcast(classifier)

  /** Convenience: batch-mode end-to-end run (tests, T-tables). */
  def detectBatch(spark: SparkSession, raw: Dataset[RawLog], models: Models,
                  classifier: PoolClassifier = new PoolClassifier(),
                  gap: String = "5 seconds"): Dataset[MoniLogPipeline.AnomalyReport] =
    MoniLogPipeline.pipeline(raw, broadcastModels(spark, models),
                             broadcastClassifier(spark, classifier), gap)
}
