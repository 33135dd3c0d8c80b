package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

/** Invariants of the refinement phase (Alg. 1): no false negatives, sound
  * bounds, correct candidate admission.
  */
class RefinementSpec extends AnyFunSuite {

  private def runRefinement(f: TestData.Fixture, query: Array[String],
                            k: Int, alpha: Double): RefinementOutput = {
    val coll = new SetCollection(f.records)
    val idx = new BruteForceSimilarityIndex(coll.vocabulary, f.simFn)
    val stream = new TokenStream(query, idx, alpha)
    Refinement.run(coll.records, coll.inverted, stream, query,
      KoiosParams(k, alpha), deadlineNanos = 0L)
  }

  test("candidates are exactly the sets with non-zero semantic overlap") {
    val rng = new Random(60)
    for (_ <- 1 to 20) {
      val f = TestData.fixture(rng)
      val query = TestData.randomQuery(rng, f)
      val out = runRefinement(f, query, k = 3, alpha = 0.7)
      val nonZero = Reference.allScores(f.records, query, f.simFn, 0.7).length
      assert(out.candidates == nonZero,
        s"admitted ${out.candidates} candidates but $nonZero sets have SO > 0")
    }
  }

  test("survivors are a superset of the true top-k (no false negatives)") {
    val rng = new Random(61)
    for (trial <- 1 to 40) {
      val f = TestData.fixture(rng)
      val query = if (trial % 2 == 0) TestData.randomQuery(rng, f) else TestData.corpusQuery(rng, f)
      val k = 1 + rng.nextInt(5)
      val alpha = Seq(0.5, 0.7, 0.8, 0.9)(rng.nextInt(4))
      val out = runRefinement(f, query, k, alpha)
      val thetaStar = Reference.thetaKStar(f.records, query, f.simFn, alpha, k)
      val mustKeep = Reference.allScores(f.records, query, f.simFn, alpha)
        .filter(_.score > thetaStar + 1e-9) // strictly-above sets can never be pruned
        .map(_.id)
        .toSet
      val kept = out.survivors.map(s => f.records(s.idx).id).toSet
      assert(mustKeep.subsetOf(kept),
        s"trial $trial: pruned required ids ${mustKeep -- kept}")
    }
  }

  test("final bounds bracket the true SO: lb ≤ SO ≤ ub") {
    val rng = new Random(62)
    for (_ <- 1 to 30) {
      val f = TestData.fixture(rng)
      val query = TestData.randomQuery(rng, f)
      val alpha = 0.7
      val out = runRefinement(f, query, k = 3, alpha = alpha)
      out.survivors.foreach { sv =>
        val so = Matching.semanticOverlapDirect(
          query, f.records(sv.idx).tokens, f.simFn, alpha)
        assert(sv.lb <= so + 1e-9,
          s"set ${sv.idx}: lb ${sv.lb} exceeds SO $so")
        assert(sv.ub >= so - 1e-9,
          s"set ${sv.idx}: ub ${sv.ub} below SO $so")
      }
    }
  }

  test("lower bound is at least the vanilla overlap (§V initialization)") {
    val rng = new Random(63)
    for (_ <- 1 to 20) {
      val f = TestData.fixture(rng)
      val query = TestData.corpusQuery(rng, f)
      val out = runRefinement(f, query, k = 3, alpha = 0.8)
      out.survivors.foreach { sv =>
        val vanilla = query.toSet.intersect(f.records(sv.idx).tokens.toSet).size
        assert(sv.lb >= vanilla - 1e-9)
      }
    }
  }

  test("θ_lb never exceeds θ_k* (Lemma 4)") {
    val rng = new Random(64)
    for (_ <- 1 to 30) {
      val f = TestData.fixture(rng)
      val query = TestData.randomQuery(rng, f)
      val k = 1 + rng.nextInt(4)
      val out = runRefinement(f, query, k, 0.7)
      val thetaStar = Reference.thetaKStar(f.records, query, f.simFn, 0.7, k)
      assert(out.topkLb.threshold <= thetaStar + 1e-9)
    }
  }

  test("candidate accounting: candidates = pruned + survivors") {
    val rng = new Random(65)
    for (_ <- 1 to 20) {
      val f = TestData.fixture(rng)
      val query = TestData.randomQuery(rng, f)
      val out = runRefinement(f, query, k = 2, alpha = 0.7)
      assert(out.candidates == out.iubPruned + out.survivors.length)
    }
  }

  test("edge cache holds every α-edge needed for verification") {
    val rng = new Random(66)
    val f = TestData.fixture(rng)
    val query = TestData.randomQuery(rng, f)
    val alpha = 0.7
    val out = runRefinement(f, query, k = 3, alpha = alpha)
    // Every (q, t) pair with sim ≥ α must be in the cache with its exact sim.
    for (t <- f.vocab; qi <- query.indices) {
      val s = f.simFn.sim(query(qi), t)
      if (s >= alpha) {
        val es = out.edgeCache.getOrElse(t, Array.empty[(Int, Double)])
        val hit = es.find(_._1 == qi)
        assert(hit.isDefined, s"missing edge ($qi, $t)")
        assert(math.abs(hit.get._2 - s) < 1e-9)
      }
    }
  }

  test("survivors arrive sorted by descending upper bound") {
    val rng = new Random(67)
    val f = TestData.fixture(rng, nSets = 60)
    val query = TestData.corpusQuery(rng, f)
    val out = runRefinement(f, query, k = 2, alpha = 0.7)
    val ubs = out.survivors.map(_.ub)
    assert(ubs == ubs.sorted(Ordering[Double].reverse))
  }

  test("empty query produces no candidates") {
    val rng = new Random(68)
    val f = TestData.fixture(rng)
    val out = runRefinement(f, Array.empty[String], k = 2, alpha = 0.7)
    assert(out.candidates == 0)
    assert(out.survivors.isEmpty)
  }
}
