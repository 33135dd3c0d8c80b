package repro.core

import scala.collection.mutable

/** A candidate that survived refinement, with its final bounds.
  *
  * At stream end every α-edge has been observed, so `ub` is the capped sum of
  * per-element maximum similarities (unseen elements only have sub-α edges,
  * which contribute 0 to `SO`), and `lb` is the complete greedy matching
  * score: `lb ≤ SO(C) ≤ ub`.
  */
final case class Survivor(idx: Int, lb: Double, ub: Double)

/** Output of the refinement phase. `edgeCache` maps each streamed token to
  * its (qIdx, sim ≥ α) edges — the similarity cache the paper reuses to build
  * matching matrices during post-processing (§VIII-A3).
  */
final case class RefinementOutput(
    survivors: IndexedSeq[Survivor],
    edgeCache: collection.Map[String, Array[(Int, Double)]],
    topkLb: TopKList,
    candidates: Int,
    iubPruned: Int,
    streamTuples: Long,
    timedOut: Boolean)

/** Algorithm 1 — candidate selection with the UB/LB/iUB/iLB filters.
  *
  * Candidates arrive from the token stream × inverted index in descending
  * order of their initial upper bound. Per candidate we maintain:
  *
  *  - `lb`: the partial greedy matching score (iLB, Lemma 5). Stream order is
  *    descending weight, so accepting every valid edge *is* the greedy
  *    matching. Initialized to the vanilla overlap |Q ∩ C| (§V).
  *  - `ubScore`/`seenUB`: the sum of each element's first-seen (= maximum)
  *    similarity, capped at `min(|Q|,|C|)` elements, giving the sound
  *    incremental upper bound `iUB = ubScore + m·s` with
  *    `m = min(|Q|,|C|) − seenUB` and `s` the current stream similarity
  *    (see DESIGN.md §1 for the Lemma 6 soundness fix).
  *
  * Candidates are bucketized by `m`; each bucket is ordered ascending by
  * `ubScore` so the prune condition `ubScore < θ_lb − m·s` is a prefix scan.
  */
object Refinement {

  def run(records: IndexedSeq[SetRecord],
          inverted: InvertedIndex,
          stream: TokenStream,
          query: Array[String],
          params: KoiosParams,
          deadlineNanos: Long): RefinementOutput = {

    val qTokenSet: Map[String, Int] = query.zipWithIndex.toMap
    val topkLb = new TopKList(params.k)

    final class Cand(val idx: Int, val minQC: Int) {
      var lb: Double = 0.0
      var ubScore: Double = 0.0
      var seenUB: Int = 0
      val matchedQ = new java.util.BitSet(query.length)
      val matchedTokens = mutable.HashSet.empty[String]
      def m: Int = minQC - seenUB
      def ubAt(s: Double): Double = ubScore + m * s
    }

    val cands = mutable.HashMap.empty[Int, Cand]
    val pruned = new java.util.BitSet(records.length)
    val admitted = new java.util.BitSet(records.length)
    val seenTokensGlobal = mutable.HashSet.empty[String]
    val edgeCache = mutable.HashMap.empty[String, mutable.ArrayBuffer[(Int, Double)]]

    // Buckets: m → candidates ordered ascending by (ubScore, idx).
    val buckets = mutable.HashMap.empty[Int, mutable.TreeSet[(Double, Int)]]
    def bucketAdd(c: Cand): Unit =
      buckets.getOrElseUpdate(c.m, mutable.TreeSet.empty[(Double, Int)]).add((c.ubScore, c.idx))
    def bucketRemove(c: Cand, mOld: Int, ubOld: Double): Unit =
      buckets.get(mOld).foreach { t => t.remove((ubOld, c.idx)); if (t.isEmpty) buckets.remove(mOld) }

    var nCandidates = 0
    var nPruned = 0
    var timedOut = false

    def pruneCandidate(idx: Int): Unit = {
      cands.remove(idx)
      pruned.set(idx)
      nPruned += 1
    }

    /** Prefix-scan every bucket against the current θ_lb and stream sim.
      * Pruning gets [[Matching.PruneEps]] slack — see its doc comment.
      */
    def scanBuckets(s: Double): Unit = {
      val theta = topkLb.threshold
      if (theta <= 0.0) return
      val ms = buckets.keysIterator.toArray
      var bi = 0
      while (bi < ms.length) {
        val m = ms(bi)
        val bound = theta - m * s - Matching.PruneEps
        if (bound > 0.0) {
          val tree = buckets(m)
          var continue = true
          while (continue && tree.nonEmpty) {
            val head = tree.head
            if (head._1 < bound) { tree.remove(head); pruneCandidate(head._2) }
            else continue = false
          }
          if (tree.isEmpty) buckets.remove(m)
        }
        bi += 1
      }
    }

    var tupleCount = 0L
    while (stream.hasNext && !timedOut) {
      val tup = stream.next()
      tupleCount += 1
      val token = tup.token
      val s = tup.sim

      edgeCache.getOrElseUpdate(token, new mutable.ArrayBuffer[(Int, Double)]()) +=
        ((tup.qIdx, s))
      val firstArrival = seenTokensGlobal.add(token)
      val isQueryToken = qTokenSet.contains(token)

      val posting = inverted.get(token)
      var p = 0
      while (p < posting.length) {
        val idx = posting(p)
        if (!pruned.get(idx)) {
          cands.get(idx) match {
            case None =>
              if (!admitted.get(idx)) {
                // First token of this set: admit with vanilla-overlap init.
                admitted.set(idx)
                nCandidates += 1
                val rec = records(idx)
                val c = new Cand(idx, math.min(query.length, rec.size))
                var v = 0
                var ti = 0
                while (ti < rec.tokens.length) {
                  val t = rec.tokens(ti)
                  qTokenSet.get(t) match {
                    case Some(qi) =>
                      v += 1
                      c.matchedQ.set(qi)
                      c.matchedTokens += t
                    case None => ()
                  }
                  ti += 1
                }
                c.lb = v.toDouble
                c.ubScore = v.toDouble
                c.seenUB = v // v ≤ |Q ∩ C| ≤ minQC
                // The admitting tuple itself (skip if pre-counted as vanilla).
                if (!isQueryToken) {
                  if (c.seenUB < c.minQC) { c.ubScore += s; c.seenUB += 1 }
                  if (!c.matchedQ.get(tup.qIdx) && !c.matchedTokens.contains(token)) {
                    c.lb += s; c.matchedQ.set(tup.qIdx); c.matchedTokens += token
                  }
                }
                // UB-Filter on arrival (Lemma 2 / initial iUB).
                if (c.ubAt(s) < topkLb.threshold - Matching.PruneEps) {
                  pruned.set(idx); nPruned += 1
                }
                else {
                  cands.put(idx, c)
                  bucketAdd(c)
                  topkLb.update(idx.toLong, c.lb)
                }
              }
            case Some(c) =>
              // iUB: count this element's first-seen (max) similarity once.
              if (firstArrival && !isQueryToken && c.seenUB < c.minQC) {
                val mOld = c.m; val ubOld = c.ubScore
                c.ubScore += s; c.seenUB += 1
                bucketRemove(c, mOld, ubOld)
                bucketAdd(c)
              }
              // iLB: extend the partial greedy matching with a valid edge.
              if (!c.matchedQ.get(tup.qIdx) && !c.matchedTokens.contains(token)) {
                c.lb += s; c.matchedQ.set(tup.qIdx); c.matchedTokens += token
                topkLb.update(idx.toLong, c.lb)
              }
          }
        }
        p += 1
      }

      scanBuckets(s)

      if ((tupleCount & 1023L) == 0L && deadlineNanos > 0 && System.nanoTime() > deadlineNanos)
        timedOut = true
    }

    // Stream exhausted: unseen elements only have sub-α edges, so the final
    // upper bound is the capped sum of seen maxima; prune a last time.
    val theta = topkLb.threshold
    val survivors = new mutable.ArrayBuffer[Survivor](cands.size)
    cands.valuesIterator.foreach { c =>
      if (c.ubScore < theta - Matching.PruneEps) nPruned += 1
      else survivors += Survivor(c.idx, c.lb, c.ubScore)
    }

    val frozen = mutable.HashMap.empty[String, Array[(Int, Double)]]
    edgeCache.foreach { case (t, buf) => frozen.put(t, buf.toArray) }

    RefinementOutput(
      survivors = survivors.sortBy(sv => (-sv.ub, sv.idx)).toIndexedSeq,
      edgeCache = frozen,
      topkLb = topkLb,
      candidates = nCandidates,
      iubPruned = nPruned,
      streamTuples = tupleCount,
      timedOut = timedOut)
  }
}
