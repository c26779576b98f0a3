package repro.logs

import org.apache.spark.sql.Dataset
import scala.util.Random

import repro.logs.LogModel._

/** LogRobust-style log-instability injection (§III of the paper).
  *
  * Applied to a generated corpus at a configurable ratio, it rewrites a
  * line with one of the real-world instability classes the paper lists:
  *
  *   1. statement twist — a static token is replaced by a variant
  *      (simulates a developer editing a log statement under CI);
  *   2. token insertion — an extra static token appears (same cause);
  *   3. parsing noise — two adjacent tokens merge (simulates a badly
  *      parsed / badly framed logline);
  *   4. duplication — the line is delivered twice (transport noise);
  *   5. local shuffle — the timestamp is jittered so the line arrives
  *      out of order (variable source-to-storage distance, §I).
  *
  * The ground-truth `templateId` is preserved — a twisted line still
  * belongs to its origin statement — and `unstable` is set, so the
  * robustness experiment can score detectors against stable truth while
  * token-level parser scoring can exclude rewritten lines.
  */
object Instability {

  /** Deterministic synonym table for statement twists; tokens without an
    * entry get a `_v2` suffix (a refactor-style rename).
    */
  private val synonyms: Map[String, String] = Map(
    "Sending"     -> "Transmitting",
    "Received"    -> "Got",
    "Connection"  -> "Link",
    "opened"      -> "established",
    "closed"      -> "terminated",
    "Allocating"  -> "Reserving",
    "Replicating" -> "Copying",
    "Scheduling"  -> "Placing",
    "Spawning"    -> "Starting",
    "Receiving"   -> "Ingesting",
    "Instance"    -> "VM",
    "User"        -> "Account",
    "Token"       -> "Ticket",
    "Session"     -> "Sess",
    "Volume"      -> "Vol",
  )

  /** Apply instability to `ratio` of the lines (deterministic in seed). */
  def inject(lines: Dataset[LogLine], ratio: Double, seed: Long = 7L): Dataset[LogLine] = {
    import lines.sparkSession.implicits._
    lines.flatMap(l => injectLine(l, ratio, seed))
  }

  /** Per-line transform; exposed for unit tests. */
  def injectLine(l: LogLine, ratio: Double, seed: Long): Seq[LogLine] = {
    val rng = new Random(seed ^ (l.lineId * 0xC2B2AE3D27D4EB4FL))
    if (rng.nextDouble() >= ratio) Seq(l)
    else rng.nextInt(5) match {
      case 0 => Seq(twist(l, rng))
      case 1 => Seq(insertToken(l, rng))
      case 2 => Seq(mergeTokens(l, rng))
      case 3 => // duplication: same content, distinct line id, slightly later
        Seq(l, l.copy(lineId = l.lineId | (1L << 40),
                      ts = new java.sql.Timestamp(l.ts.getTime + 1),
                      unstable = true))
      case _ =>
        // local shuffle: the line is delivered out of order. The header
        // timestamp is what MoniLog's structuring step sorts by (that is
        // precisely how it absorbs mixed-order arrival, §I), so arrival
        // shuffling surfaces as a small residual clock jitter here.
        val jitter = (rng.nextInt(9) - 4).toLong
        Seq(l.copy(ts = new java.sql.Timestamp(l.ts.getTime + jitter), unstable = true))
    }
  }

  /** Replace one static token with a synonym / renamed variant. */
  private def twist(l: LogLine, rng: Random): LogLine = {
    val msgToks  = l.message.split(" ")
    val tmplToks = l.template.split(" ")
    val staticIdx = tmplToks.indices.filter(i => i < msgToks.length && tmplToks(i) != "<*>")
    if (staticIdx.isEmpty) l.copy(unstable = true)
    else {
      val i = staticIdx(rng.nextInt(staticIdx.size))
      val replaced = synonyms.getOrElse(msgToks(i), msgToks(i) + "_v2")
      l.copy(message = msgToks.updated(i, replaced).mkString(" "), unstable = true)
    }
  }

  /** Insert an extra static token after the first token. */
  private def insertToken(l: LogLine, rng: Random): LogLine = {
    val extra = Seq("verbosely", "now", "async", "retrying")(rng.nextInt(4))
    val toks  = l.message.split(" ").toSeq
    l.copy(message = (toks.take(1) ++ Seq(extra) ++ toks.drop(1)).mkString(" "),
           unstable = true)
  }

  /** Merge two adjacent tokens (simulated parsing/framing error). */
  private def mergeTokens(l: LogLine, rng: Random): LogLine = {
    val toks = l.message.split(" ")
    if (toks.length < 2) l.copy(unstable = true)
    else {
      val i = rng.nextInt(toks.length - 1)
      val merged = (toks.take(i) :+ (toks(i) + toks(i + 1))) ++ toks.drop(i + 2)
      l.copy(message = merged.mkString(" "), unstable = true)
    }
  }
}
