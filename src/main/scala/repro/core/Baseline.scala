package repro.core

import scala.collection.mutable

/** The paper's baselines (§VIII-A4).
  *
  * **Baseline**: uses the token stream only for candidate generation (any set
  * with ≥1 element of similarity ≥ α to a query element), then computes the
  * exact bipartite matching for *every* candidate and keeps a top-k list.
  *
  * **Baseline+** (`useIubFilter = true`): additionally activates the
  * refinement-phase iUB filter (needed to make WDC-scale repositories
  * feasible), then verifies every survivor — no No-EM or early termination.
  */
final class BaselineEngine(repo: SetCollection, index: SimilarityIndex,
                           useIubFilter: Boolean = false) extends Serializable {

  def search(queryTokens: Seq[String], params: KoiosParams): SearchResult = {
    val query = queryTokens.distinct.toArray
    val deadline =
      if (params.timeoutMs > 0) System.nanoTime() + params.timeoutMs * 1000000L else 0L
    val t0 = System.nanoTime()

    val stream = new TokenStream(query, index, params.alpha)

    var candIdxs: IndexedSeq[Int] = IndexedSeq.empty
    var edgeCache: scala.collection.Map[String, Array[(Int, Double)]] = Map.empty
    var streamTuples = 0L
    var candidates = 0
    var iubPruned = 0
    var refTimedOut = false

    if (useIubFilter) {
      val ref = Refinement.run(repo.records, repo.inverted, stream, query, params, deadline)
      candIdxs = ref.survivors.map(_.idx)
      edgeCache = ref.edgeCache
      streamTuples = ref.streamTuples
      candidates = ref.candidates
      iubPruned = ref.iubPruned
      refTimedOut = ref.timedOut
    } else {
      val cache = mutable.HashMap.empty[String, mutable.ArrayBuffer[(Int, Double)]]
      val seen = new java.util.BitSet(repo.records.length)
      while (stream.hasNext && !refTimedOut) {
        val tup = stream.next()
        streamTuples += 1
        cache.getOrElseUpdate(tup.token, new mutable.ArrayBuffer[(Int, Double)]()) +=
          ((tup.qIdx, tup.sim))
        repo.inverted.get(tup.token).foreach(seen.set)
        if ((streamTuples & 1023L) == 0L && deadline > 0 && System.nanoTime() > deadline)
          refTimedOut = true
      }
      val idxs = mutable.ArrayBuffer.empty[Int]
      var i = seen.nextSetBit(0)
      while (i >= 0) { idxs += i; i = seen.nextSetBit(i + 1) }
      val frozen = mutable.HashMap.empty[String, Array[(Int, Double)]]
      cache.foreach { case (t, buf) => frozen.put(t, buf.toArray) }
      candIdxs = idxs.toIndexedSeq
      edgeCache = frozen
      candidates = idxs.length
    }
    val t1 = System.nanoTime()

    val edgesOf: String => Array[(Int, Double)] =
      t => edgeCache.getOrElse(t, Array.empty[(Int, Double)])
    // Same kernel choice as Koios: full |Q|x|C| matrices (the paper's
    // implementation) unless reducedGraphs is set.
    def graphOf(idx: Int): Matching.Graph =
      if (params.reducedGraphs) Matching.buildGraph(repo.records(idx).tokens, edgesOf)
      else Matching.buildFullGraph(query.length, repo.records(idx).tokens, edgesOf)
    val topk = mutable.PriorityQueue.empty[ScoredSet](Ordering.by(r => (-r.score, r.id)))
    var emComputed = 0
    var timedOut = refTimedOut
    val it = candIdxs.iterator
    while (it.hasNext && !timedOut) {
      val idx = it.next()
      Matching.semanticOverlap(graphOf(idx)) match {
        case Completed(so) =>
          emComputed += 1
          if (so > 0.0) {
            topk.enqueue(ScoredSet(repo.records(idx).id, so))
            if (topk.size > params.k) topk.dequeue()
          }
        case EarlyTerminated => throw new IllegalStateException("unreachable")
      }
      if (deadline > 0 && System.nanoTime() > deadline) timedOut = true
    }
    val t2 = System.nanoTime()

    val mem =
      SizeEst.ofTokenStream(stream.bufferedPairs) +
        SizeEst.ofEdgeCache(edgeCache) +
        SizeEst.ofPostProcessing(params.k, candIdxs.length)

    SearchResult(
      topk = topk.toSeq.sortBy(r => (-r.score, r.id)),
      stats = SearchStats(
        candidates = candidates,
        iubPruned = iubPruned,
        survivors = candIdxs.length,
        emComputed = emComputed,
        streamTuples = streamTuples,
        refinementMs = (t1 - t0) / 1e6,
        postprocMs = (t2 - t1) / 1e6,
        memBytes = mem,
        timedOut = timedOut))
  }
}
