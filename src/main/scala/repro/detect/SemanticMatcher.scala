package repro.detect

import repro.parse.Preprocess

/** Semantic template matching — the LogRobust / LogAnomaly surrogate.
  *
  * Both cited systems survive log-statement instability by mapping a new
  * (variant) template near its origin template in a semantic vector
  * space. This class reproduces that mechanism with normalized lexical
  * overlap: an unseen template is mapped onto the known template with the
  * highest token-set similarity when it clears `tau`, otherwise it is
  * reported as genuinely novel. Combined with [[NGramModel]] this gives
  * the "robust" detector of experiment T3; without it the exact-id model
  * reproduces DeepLog's collapse under instability.
  */
class SemanticMatcher(
    knownTemplates: Map[Int, Seq[String]],
    val tau: Double = 0.5,
) extends Serializable {

  /** Normalize a token for comparison: case-fold, strip punctuation and
    * version-y suffixes — the lexical stand-in for embedding proximity
    * of word variants.
    */
  private def norm(tok: String): String =
    tok.toLowerCase.replaceAll("[^a-z0-9*]", "").stripSuffix("v2")

  private def keyTokens(toks: Seq[String]): Set[String] =
    toks.filterNot(_.contains("<*>")).map(norm).filter(_.nonEmpty).toSet

  private val known: Seq[(Int, Set[String])] =
    knownTemplates.toSeq.sortBy(_._1).map { case (id, toks) => id -> keyTokens(toks) }

  /** Jaccard similarity of normalized static-token sets. */
  def similarity(a: Seq[String], b: Seq[String]): Double = {
    val sa = keyTokens(a); val sb = keyTokens(b)
    if (sa.isEmpty && sb.isEmpty) 1.0
    else if (sa.isEmpty || sb.isEmpty) 0.0
    else sa.intersect(sb).size.toDouble / sa.union(sb).size
  }

  /** Map an unseen template's tokens onto the closest known template id,
    * when the match clears tau.
    *
    * Scoring is the *coverage of the known template's static tokens* by
    * the candidate (after masking variable-looking candidate tokens): a
    * variant statement still contains most of its origin's static words,
    * while its variable values must not dilute the score. Ties prefer
    * the template whose static set is better covered in return (fewer
    * spurious absorptions of short templates into long messages).
    */
  def mapTemplate(tokens: Seq[String]): Option[Int] = {
    val cand = tokens.filterNot(t => t.contains("<*>") || Preprocess.looksVariable(t))
      .map(norm).filter(_.nonEmpty).toSet
    if (cand.isEmpty) return None
    var bestId  = -1
    var bestKey = (-1.0, -1.0)
    known.foreach { case (id, ks) =>
      if (ks.nonEmpty) {
        val inter    = cand.intersect(ks).size.toDouble
        val coverage = inter / ks.size
        val backCov  = inter / cand.size
        if (coverage > bestKey._1 ||
            (coverage == bestKey._1 && backCov > bestKey._2)) {
          bestKey = (coverage, backCov); bestId = id
        }
      }
    }
    if (bestKey._1 >= tau) Some(bestId) else None
  }

  /** Convenience: map a raw message. */
  def mapMessage(message: String): Option[Int] =
    mapTemplate(Preprocess.tokenize(message))
}
