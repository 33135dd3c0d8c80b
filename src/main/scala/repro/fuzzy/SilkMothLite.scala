package repro.fuzzy

import scala.collection.mutable
import repro.core._

/** A faithful-in-structure reimplementation of the SilkMoth comparison
  * systems of §VIII-B: *threshold-based* fuzzy set search with maximum
  * matching semantics, adapted to top-k by passing the true `θ_k*` (the
  * paper's protocol, which advantages SilkMoth).
  *
  * Two variants:
  *
  *  - **semantic** (`syntactic = false`): the generic search framework the
  *    SilkMoth authors suggest, with all similarity-function-specific filters
  *    removed — candidates are sets sharing ≥1 α-similar element with the
  *    query; every candidate is verified with the exact matching.
  *  - **syntactic** (`syntactic = true`): adds the Jaccard-specific machinery
  *    — prefix-filter signatures over token q-grams to find similar tokens
  *    without scanning the vocabulary, plus the capped per-element
  *    upper-bound check before verification.
  *
  * Only the syntactic variant requires `simFn` to be
  * [[repro.core.JaccardQGramSimilarity]]; the semantic variant takes any
  * symmetric similarity.
  */
final class SilkMothLite(repo: SetCollection, simFn: TokenSimilarity, alpha: Double,
                         syntactic: Boolean) {

  private val jaccard: Option[JaccardQGramSimilarity] = simFn match {
    case j: JaccardQGramSimilarity => Some(j)
    case _                         => None
  }
  require(!syntactic || jaccard.isDefined,
    "the syntactic variant's signature filters are Jaccard-specific")

  // Gram inverted index over the vocabulary (signature probing target).
  private lazy val gramIndex: mutable.HashMap[String, mutable.ArrayBuffer[String]] = {
    val m = mutable.HashMap.empty[String, mutable.ArrayBuffer[String]]
    val j = jaccard.get
    repo.vocabulary.foreach { t =>
      j.grams(t).foreach(g => m.getOrElseUpdate(g, new mutable.ArrayBuffer[String]()) += t)
    }
    m
  }

  /** Vocabulary tokens with `sim(q, t) ≥ α`, per query token. */
  private def similarTokens(query: Array[String]): Array[Array[(String, Double)]] =
    if (syntactic) {
      val j = jaccard.get
      query.map { q =>
        val gs = j.grams(q).toArray.sorted
        // Prefix filter: Jaccard(a, b) ≥ α needs a shared gram among the
        // first |g(a)| − ceil(α·|g(a)|) + 1 grams (any fixed global order).
        val prefixLen = gs.length - math.ceil(alpha * gs.length).toInt + 1
        val cands = mutable.HashSet.empty[String]
        gs.take(math.max(1, prefixLen)).foreach { g =>
          gramIndex.get(g).foreach(cands ++= _)
        }
        cands += q // identical token, even if gram-prefix misses it
        cands.iterator
          .map(t => (t, simFn.sim(q, t)))
          .filter(_._2 >= alpha)
          .toArray
          .sortBy { case (t, s) => (-s, t) }
      }
    } else {
      val index = new BruteForceSimilarityIndex(repo.vocabulary, simFn)
      query.map(q => index.neighbors(q, alpha))
    }

  /** All sets with `SO(Q, C) ≥ theta` and their exact scores. */
  def thresholdSearch(queryTokens: Seq[String], theta: Double): Seq[ScoredSet] =
    thresholdSearchTimed(queryTokens, theta, 0L)._1

  /** Like [[thresholdSearch]] with a wall-clock budget; returns the partial
    * result and whether the budget was exhausted (the benches' timeout
    * protocol, §VIII-B).
    */
  def thresholdSearchTimed(queryTokens: Seq[String], theta: Double, timeoutMs: Long)
      : (Seq[ScoredSet], Boolean) = {
    val deadline = if (timeoutMs > 0) System.nanoTime() + timeoutMs * 1000000L else 0L
    val query = queryTokens.distinct.toArray
    val perQ = similarTokens(query)

    // Edge lists keyed by vocabulary token (the verification matrix input).
    val edges = mutable.HashMap.empty[String, mutable.ArrayBuffer[(Int, Double)]]
    perQ.zipWithIndex.foreach { case (ts, qi) =>
      ts.foreach { case (t, s) =>
        edges.getOrElseUpdate(t, new mutable.ArrayBuffer[(Int, Double)]()) += ((qi, s))
      }
    }
    val edgesOf: String => Array[(Int, Double)] =
      t => edges.get(t).map(_.toArray).getOrElse(Array.empty)

    val candIdxs = mutable.SortedSet.empty[Int]
    edges.keysIterator.foreach(t => repo.inverted.get(t).foreach(candIdxs += _))

    var timedOut = false
    val out = mutable.ArrayBuffer.empty[ScoredSet]
    val it = candIdxs.iterator
    while (it.hasNext && !timedOut) {
      val idx = it.next()
      val rec = repo.records(idx)
      val verify =
        if (!syntactic) true
        else {
          // Capped per-element upper bound (generic SilkMoth check phase).
          val maxSims = rec.tokens.iterator
            .map(t => edgesOf(t).foldLeft(0.0)((m, e) => math.max(m, e._2)))
            .filter(_ > 0.0)
            .toArray
            .sorted(Ordering[Double].reverse)
          maxSims.take(math.min(query.length, rec.size)).sum >= theta
        }
      if (verify) {
        // Same kernel as the engines' default: full |Q|×|C| matrix (§VIII-A3).
        Matching.semanticOverlap(
          Matching.buildFullGraph(query.length, rec.tokens, edgesOf)) match {
          case Completed(so) => if (so >= theta && so > 0.0) out += ScoredSet(rec.id, so)
          case EarlyTerminated => throw new IllegalStateException("unreachable")
        }
      }
      if (deadline > 0 && System.nanoTime() > deadline) timedOut = true
    }
    (out.sortBy(r => (-r.score, r.id)).toSeq, timedOut)
  }

  /** Top-k adaptation (§VIII-B): threshold search at the true `θ_k*`, then a
    * top-k priority queue over the result.
    */
  def topK(queryTokens: Seq[String], k: Int, thetaKStar: Double): Seq[ScoredSet] =
    thresholdSearch(queryTokens, thetaKStar).take(k)
}
