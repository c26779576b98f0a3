package repro.core

/** Shared evaluation metrics (the paper's §III definitions). */
object Metrics {

  /** Precision / recall / F1 over binary decisions. */
  final case class PRF(tp: Long, fp: Long, fn: Long, tn: Long) {
    def precision: Double = if (tp + fp == 0) 0.0 else tp.toDouble / (tp + fp)
    def recall: Double    = if (tp + fn == 0) 0.0 else tp.toDouble / (tp + fn)
    def f1: Double = {
      val p = precision; val r = recall
      if (p + r == 0) 0.0 else 2 * p * r / (p + r)
    }
    override def toString: String = f"P=$precision%.3f R=$recall%.3f F1=$f1%.3f"
  }

  /** Score (predictedAnomaly, actualAnomaly) pairs. */
  def score(decisions: Iterable[(Boolean, Boolean)]): PRF = {
    var tp = 0L; var fp = 0L; var fn = 0L; var tn = 0L
    decisions.foreach {
      case (true, true)   => tp += 1
      case (true, false)  => fp += 1
      case (false, true)  => fn += 1
      case (false, false) => tn += 1
    }
    PRF(tp, fp, fn, tn)
  }
}
