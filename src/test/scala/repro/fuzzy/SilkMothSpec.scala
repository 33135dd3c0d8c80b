package repro.fuzzy

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import scala.util.Random

class SilkMothSpec extends AnyFunSuite {

  private val words = Array(
    "blaine", "blain", "boston", "charleston", "charlestown", "columbia",
    "newyork", "newyorkcity", "appleton", "seattle", "seattles", "portland",
    "portlandia", "denver", "denvers", "miami", "springfield", "springfields")

  private def mkRepo(rng: Random, nSets: Int = 30, maxCard: Int = 8): SetCollection =
    new SetCollection(IndexedSeq.tabulate(nSets) { i =>
      SetRecord(i.toLong, rng.shuffle(words.toSeq).take(1 + rng.nextInt(maxCard)))
    })

  private val jac = new JaccardQGramSimilarity(3)

  test("threshold search returns exactly the sets with SO ≥ θ (semantic variant)") {
    val rng = new Random(110)
    for (_ <- 1 to 15) {
      val repo = mkRepo(rng)
      val query = rng.shuffle(words.toSeq).take(4)
      val alpha = 0.5
      val theta = 1.0 + rng.nextDouble()
      val sm = new SilkMothLite(repo, jac, alpha, syntactic = false)
      val got = sm.thresholdSearch(query, theta).map(r => r.id -> r.score).toMap
      val expected = Reference.allScores(repo.records, query, jac, alpha)
        .filter(_.score >= theta).map(r => r.id -> r.score).toMap
      assert(got.keySet == expected.keySet)
      got.foreach { case (id, s) => assert(math.abs(s - expected(id)) < 1e-9) }
    }
  }

  test("syntactic variant (signature filters) returns the same results") {
    val rng = new Random(111)
    for (_ <- 1 to 15) {
      val repo = mkRepo(rng)
      val query = rng.shuffle(words.toSeq).take(4)
      val alpha = 0.5
      val theta = 1.0 + rng.nextDouble()
      val sem = new SilkMothLite(repo, jac, alpha, syntactic = false)
      val syn = new SilkMothLite(repo, jac, alpha, syntactic = true)
      val a = sem.thresholdSearch(query, theta).map(r => (r.id, r.score))
      val b = syn.thresholdSearch(query, theta).map(r => (r.id, r.score))
      assert(a == b)
    }
  }

  test("prefix filter finds all α-similar token pairs (completeness)") {
    val rng = new Random(112)
    val repo = mkRepo(rng, nSets = 10)
    val alpha = 0.5
    val sm = new SilkMothLite(repo, jac, alpha, syntactic = true)
    // Completeness is implied by threshold-search equivalence; spot-check a
    // known similar pair survives the signature path end-to-end.
    val res = sm.thresholdSearch(Seq("blaine"), 0.5)
    val expected = Reference.allScores(repo.records, Seq("blaine"), jac, alpha)
      .filter(_.score >= 0.5).map(_.id).toSet
    assert(res.map(_.id).toSet == expected)
  }

  test("top-k adaptation with true θ_k* matches the reference top-k") {
    val rng = new Random(113)
    for (_ <- 1 to 10) {
      val repo = mkRepo(rng)
      val query = rng.shuffle(words.toSeq).take(5)
      val alpha = 0.5
      val k = 3
      val thetaStar = Reference.thetaKStar(repo.records, query, jac, alpha, k)
      if (thetaStar > 0) {
        val sm = new SilkMothLite(repo, jac, alpha, syntactic = true)
        val got = sm.topK(query, k, thetaStar)
        val ref = Reference.topK(repo.records, query, jac, alpha, k)
        assert(got.length == ref.length)
        got.zip(ref).foreach { case (g, r) => assert(math.abs(g.score - r.score) < 1e-9) }
      }
    }
  }

  test("SilkMoth agrees with Koios under the same Jaccard similarity") {
    val rng = new Random(114)
    for (_ <- 1 to 10) {
      val repo = mkRepo(rng)
      val query = rng.shuffle(words.toSeq).take(5)
      val alpha = 0.5
      val k = 3
      val idx = new BruteForceSimilarityIndex(repo.vocabulary, jac)
      val koios = new KoiosEngine(repo, idx).search(query, KoiosParams(k, alpha))
      val thetaStar = Reference.thetaKStar(repo.records, query, jac, alpha, k)
      if (thetaStar > 0) {
        val sm = new SilkMothLite(repo, jac, alpha, syntactic = false).topK(query, k, thetaStar)
        assert(sm.map(_.score).zip(koios.topk.map(_.score))
          .forall { case (a, b) => math.abs(a - b) < 1e-9 })
      }
    }
  }

  test("syntactic variant requires a Jaccard similarity") {
    val rng = new Random(115)
    val repo = mkRepo(rng, nSets = 5)
    assertThrows[IllegalArgumentException] {
      new SilkMothLite(repo, ExactMatchSimilarity, 0.5, syntactic = true)
    }
  }
}
