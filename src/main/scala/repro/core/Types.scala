package repro.core

/** A set in the repository: an id and its distinct string elements (tokens).
  *
  * Tokens are deduplicated at construction so |C| is the set cardinality
  * regardless of how the record was produced.
  */
final case class SetRecord(id: Long, tokens: Array[String]) {
  /** Set cardinality |C|. */
  def size: Int = tokens.length
  override def toString: String = s"SetRecord($id, ${tokens.mkString("{", ",", "}")})"
}

object SetRecord {
  /** Builds a record with deduplicated tokens (stable order of first occurrence). */
  def apply(id: Long, tokens: Iterable[String]): SetRecord =
    new SetRecord(id, tokens.toSeq.distinct.toArray)
}

/** One result entry: a set id and its exact semantic overlap with the query.
  *
  * Sets admitted by the No-EM filter (Lemma 7) carry their bound interval
  * instead of an exact score unless scores were finalized; `exact` records
  * which case applies.
  */
final case class ScoredSet(id: Long, score: Double, exact: Boolean = true)

/** Filter/effort counters for one query, mirroring the paper's Tables II/IV/V.
  *
  *  - `candidates`       — sets admitted from the inverted index (non-zero SO).
  *  - `iubPruned`        — refinement prunes (UB-Filter on arrival + iUB buckets).
  *  - `survivors`        — candidates − iubPruned (enter post-processing).
  *  - `noEm`             — survivors resolved without starting a matching
  *                         (accepted by Lemma 7 or UB-pruned by a grown θ_lb).
  *  - `emEarlyTerminated`— matchings aborted by the label-sum bound (Lemma 8).
  *  - `emComputed`       — matchings run to completion.
  *  - `finalizeEms`      — matchings run solely to attach exact scores to
  *                         No-EM-accepted results (distributed merge needs
  *                         comparable scores); kept out of the filter counts.
  */
final case class SearchStats(
    candidates: Int = 0,
    iubPruned: Int = 0,
    survivors: Int = 0,
    noEm: Int = 0,
    emEarlyTerminated: Int = 0,
    emComputed: Int = 0,
    finalizeEms: Int = 0,
    streamTuples: Long = 0L,
    refinementMs: Double = 0.0,
    postprocMs: Double = 0.0,
    memBytes: Long = 0L,
    thetaLbFinal: Double = 0.0,
    timedOut: Boolean = false) {

  def totalMs: Double = refinementMs + postprocMs

  /** Element-wise sum, for aggregating over a query benchmark. */
  def +(o: SearchStats): SearchStats = SearchStats(
    candidates + o.candidates,
    iubPruned + o.iubPruned,
    survivors + o.survivors,
    noEm + o.noEm,
    emEarlyTerminated + o.emEarlyTerminated,
    emComputed + o.emComputed,
    finalizeEms + o.finalizeEms,
    streamTuples + o.streamTuples,
    refinementMs + o.refinementMs,
    postprocMs + o.postprocMs,
    memBytes + o.memBytes,
    math.max(thetaLbFinal, o.thetaLbFinal),
    timedOut || o.timedOut)
}

/** A complete answer for one query: top-k entries (descending score) + stats. */
final case class SearchResult(topk: Seq[ScoredSet], stats: SearchStats)

/** Search parameters shared by Koios and the baselines.
  *
  * @param k           result size
  * @param alpha       element-similarity threshold α (edges below count as 0)
  * @param finalizeScores when true, sets accepted by No-EM get an exact
  *                    matching at the end so every returned score is exact
  *                    (required for the distributed top-k merge); the extra
  *                    matchings are counted in `finalizeEms`, not `emComputed`.
  * @param timeoutMs   per-query wall-clock budget; ≤0 disables. On timeout the
  *                    partial result is returned with `timedOut = true`.
  * @param reducedGraphs when false (default), verification builds the full
  *                    |Q|×|C| similarity matrix per candidate — the paper's
  *                    kernel (§VIII-A3), O(max(|Q|,|C|)³) per matching. When
  *                    true, the matrix is reduced to nodes with ≥1 α-edge —
  *                    an optimization beyond the paper with identical scores.
  */
final case class KoiosParams(
    k: Int,
    alpha: Double,
    finalizeScores: Boolean = true,
    timeoutMs: Long = 0L,
    reducedGraphs: Boolean = false) {
  require(k >= 1, s"k must be >= 1, got $k")
  require(alpha > 0.0 && alpha <= 1.0, s"alpha must be in (0, 1], got $alpha")
}
