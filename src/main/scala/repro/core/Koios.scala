package repro.core

/** A repository of sets with its query-independent indexes: the inverted
  * index `I_s` and the vocabulary `D` (the similarity index over `D` is
  * supplied separately so the same collection supports different `sim`
  * functions). Index construction is excluded from response times, as in the
  * paper (§VIII-A3).
  */
final class SetCollection(val records: IndexedSeq[SetRecord]) extends Serializable {
  require(records.map(_.id).distinct.length == records.length, "set ids must be unique")
  val inverted: InvertedIndex = InvertedIndex.build(records)
  def vocabulary: Array[String] = inverted.vocabulary
}

/** End-to-end Koios search on one repository (one partition in the
  * distributed setting): refinement (Alg. 1) then post-processing (Alg. 2),
  * with phase timings, filter counters and a memory estimate.
  */
final class KoiosEngine(collection: SetCollection, index: SimilarityIndex) extends Serializable {

  def search(queryTokens: Seq[String], params: KoiosParams): SearchResult = {
    val query = queryTokens.distinct.toArray
    val deadline =
      if (params.timeoutMs > 0) System.nanoTime() + params.timeoutMs * 1000000L else 0L

    val t0 = System.nanoTime()
    val stream = new TokenStream(query, index, params.alpha)
    val ref = Refinement.run(collection.records, collection.inverted, stream, query, params, deadline)
    val t1 = System.nanoTime()
    val post = PostProcessing.run(collection.records, ref, query, params, deadline)
    val t2 = System.nanoTime()

    val mem =
      SizeEst.ofTokenStream(stream.bufferedPairs) +
        SizeEst.ofEdgeCache(ref.edgeCache) +
        SizeEst.ofCandidates(ref.candidates, query.length, avgMatched = 8.0) +
        SizeEst.ofBuckets(ref.survivors.length) +
        SizeEst.ofPostProcessing(params.k, ref.survivors.length)

    SearchResult(
      topk = post.results.take(params.k),
      stats = SearchStats(
        candidates = ref.candidates,
        iubPruned = ref.iubPruned,
        survivors = ref.survivors.length,
        noEm = post.noEm,
        emEarlyTerminated = post.emEarlyTerminated,
        emComputed = post.emComputed,
        finalizeEms = post.finalizeEms,
        streamTuples = ref.streamTuples,
        refinementMs = (t1 - t0) / 1e6,
        postprocMs = (t2 - t1) / 1e6,
        memBytes = mem,
        thetaLbFinal = ref.topkLb.threshold,
        timedOut = ref.timedOut || post.timedOut))
  }
}
