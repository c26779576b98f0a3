package repro.parse

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Evaluation metrics for log parsers.
  *
  * Implements both the literature's reference metric (grouping accuracy,
  * Zhu et al. [10]) and the paper's *proposed* token-level metric (§IV,
  * Eq. 1) that scores whether each token's static/variable identity was
  * recovered — the property quantitative anomaly detection depends on.
  */
object ParserEval {

  /** Grouping accuracy: a line is correctly parsed iff the set of lines
    * sharing its predicted group equals the set of lines sharing its
    * ground-truth group (exact group match, the standard definition).
    *
    * @param assignments (`lineId`, `templateId`) — parser output
    * @param truth       (`lineId`, `trueId`)      — ground truth
    */
  def groupingAccuracy(assignments: DataFrame, truth: DataFrame): Double = {
    val joined = assignments.join(truth, "lineId")
    val total  = joined.count()
    if (total == 0) return 0.0
    val pred = joined.groupBy("templateId").agg(count("*") as "predN")
    val tru  = joined.groupBy("trueId").agg(count("*") as "trueN")
    val pair = joined.groupBy("templateId", "trueId").agg(count("*") as "pairN")
    val correct = pair
      .join(pred, "templateId")
      .join(tru, "trueId")
      .where(col("pairN") === col("predN") && col("pairN") === col("trueN"))
      .agg(coalesce(sum("pairN"), lit(0L)))
      .head().getLong(0)
    correct.toDouble / total
  }

  /** The paper's token-level metric (Eq. 1): mean over lines of the
    * per-line fraction of tokens whose identity is recovered. A
    * ground-truth token containing `<*>` (a variable slot) is recovered
    * iff the parser's template has `<*>` at that position; a static
    * token must match exactly. Length mismatches score the missing
    * positions 0, with the ground-truth length as denominator.
    *
    * @param perLine (`lineId`, `predTemplate`, `trueTemplate`) — both
    *                templates as space-joined token strings
    */
  def tokenAccuracy(perLine: DataFrame): Double = {
    val spark = perLine.sparkSession
    import spark.implicits._
    val scores = perLine
      .select($"predTemplate".cast("string"), $"trueTemplate".cast("string"))
      .as[(String, String)]
      .map { case (pred, tru) => lineTokenScore(pred, tru) }
    val agg = scores.agg(avg("value")).head()
    if (agg.isNullAt(0)) 0.0 else agg.getDouble(0)
  }

  /** Per-line Eq. 1 term; exposed for unit tests. */
  def lineTokenScore(predTemplate: String, trueTemplate: String): Double = {
    val p = Preprocess.tokenize(predTemplate)
    val t = Preprocess.tokenize(trueTemplate)
    if (t.isEmpty) return 0.0
    val hits = t.indices.count { j =>
      j < p.length && {
        if (t(j).contains("<*>")) p(j).contains("<*>")
        else p(j) == t(j)
      }
    }
    hits.toDouble / t.length
  }
}
