package repro.tables

import org.apache.spark.sql.SparkSession

import repro.core.Metrics
import repro.core.Metrics.PRF
import repro.detect.{NGramModel, SemanticMatcher}
import repro.logs.{Instability, LogSynth}
import repro.logs.LogModel.LogLine
import repro.parse.Drain
import repro.stream.MoniLogPipeline.NovelId

/** T3 — robustness to log instability and parsing errors (§III, planned
  * experiment 2), the LogRobust protocol the paper adopts: inject 0–20 %
  * of unstable events (statement twists, extra tokens, parsing noise,
  * duplication, arrival shuffling) into the *test* stream and measure
  * how detection degrades.
  *
  * Two pipelines share the same trained parser and sequence model:
  *   - exact    — DeepLog-like: template ids come only from exact
  *     (frozen-Drain) matches; an unseen variant is an unknown event;
  *   - semantic — LogRobust/LogAnomaly-like: unmatched messages are
  *     mapped onto the nearest known template by the semantic matcher,
  *     and consecutive duplicates are collapsed (MoniLog's own noise
  *     handling, §I).
  *
  * Paper expectation (numbers from LogRobust [9]): the closed-world
  * model collapses as the ratio grows (F1 0.9+ → ~0.5) while the
  * semantic pipeline degrades mildly (→ ~0.85).
  */
object T3Instability {

  final case class Row(ratio: Double, exact: PRF, semantic: PRF)

  val Ratios: Seq[Double] = Seq(0.0, 0.05, 0.10, 0.15, 0.20)

  def run(spark: SparkSession, nSessions: Long = 4000, anomalyRate: Double = 0.03,
          seed: Long = 42L): Seq[Row] = {
    import spark.implicits._
    val corpus = LogSynth.hdfsLike(spark, nSessions, anomalyRate, quantShare = 0.0, seed)
    val all    = corpus.collect().sortBy(_.lineId)
    val cut    = (nSessions * 0.6).toLong * 64 // lineId = sessionId*64 + idx
    val train  = all.filter(l => l.lineId < cut && l.sessionLabel == "normal")
    val testDs = corpus.filter(_.lineId >= cut)

    // train the parser online on the anomaly-free history…
    val drain = new Drain(4, 0.5)
    val trainAssign = train.map(l => (l, drain.parse(l.message)))
    val matcher = new SemanticMatcher(drain.templates.view.mapValues(_.toSeq).toMap)
    // …and the sequence models on the parser's own ids. The semantic
    // pipeline collapses consecutive duplicates (its dup-noise handling),
    // so its model is trained on equally collapsed normal sequences.
    val trainSeqs = trainAssign.groupBy(_._1.sessionId).values
      .map(_.sortBy(_._1.lineId).map(_._2).toSeq).toSeq
    val ngramRaw   = new NGramModel(2, 9).fit(trainSeqs)
    val ngramDedup = new NGramModel(2, 9).fit(trainSeqs.map(dedupConsecutive))

    Ratios.map { ratio =>
      val test = Instability.inject(testDs, ratio, seed = seed + 1).collect()
      Row(ratio,
          exact = score(test, ngramRaw, assignExact(drain), collapseDups = false),
          semantic = score(test, ngramDedup, assignSemantic(drain, matcher),
                           collapseDups = true))
    }
  }

  private def assignExact(drain: Drain)(msg: String): Int =
    drain.matchOnly(msg).getOrElse(NovelId)

  private def assignSemantic(drain: Drain, matcher: SemanticMatcher)(msg: String): Int =
    drain.matchOnly(msg).orElse(matcher.mapMessage(msg)).getOrElse(NovelId)

  private def score(test: Array[LogLine], ngram: NGramModel,
                    assign: String => Int, collapseDups: Boolean): PRF = {
    val decisions = test.groupBy(_.sessionId).values.map { lines =>
      val ordered = lines.sortBy(l => (l.ts.getTime, l.lineId)).map(l => assign(l.message)).toSeq
      val events  = if (collapseDups) dedupConsecutive(ordered) else ordered
      val truth   = lines.head.sessionLabel != "normal"
      (ngram.isAnomalous(events), truth)
    }
    Metrics.score(decisions.toSeq)
  }

  private[tables] def dedupConsecutive(xs: Seq[Int]): Seq[Int] =
    xs.foldLeft(List.empty[Int]) {
      case (acc, x) if acc.headOption.contains(x) => acc
      case (acc, x)                               => x :: acc
    }.reverse

  def render(rows: Seq[Row]): String =
    TableFmt.render(
      "T3 — detection F1 vs injected instability ratio (exact vs semantic pipeline)",
      Seq("instability", "exact P", "exact R", "exact F1", "semantic P", "semantic R", "semantic F1"),
      rows.map(r => Seq(TableFmt.pct(r.ratio),
                        TableFmt.f3(r.exact.precision), TableFmt.f3(r.exact.recall),
                        TableFmt.f3(r.exact.f1),
                        TableFmt.f3(r.semantic.precision), TableFmt.f3(r.semantic.recall),
                        TableFmt.f3(r.semantic.f1))),
    )
}
