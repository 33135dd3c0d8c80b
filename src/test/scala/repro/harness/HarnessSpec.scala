package repro.harness

import org.scalatest.funsuite.AnyFunSuite
import repro.core._
import repro.data.SemanticData
import scala.util.Random

class HarnessSpec extends AnyFunSuite {

  private lazy val tiny = SemanticData.generate(SemanticData.tinyProfile)
  private lazy val engines = new PartitionedEngines(tiny, partitions = 3)

  test("partitioned Koios equals the brute-force reference") {
    val simFn = new EmbeddingCosineSimilarity(tiny.embeddings)
    val rng = new Random(150)
    for (_ <- 1 to 8) {
      val q = tiny.sets(rng.nextInt(tiny.sets.length)).tokens
      val params = KoiosParams(5, 0.8)
      val (topk, _, _) = engines.runKoios(q.toSeq, params)
      val ref = Reference.topK(tiny.sets, q.toSeq, simFn, 0.8, 5)
      assert(topk.length == ref.length)
      topk.zip(ref).foreach { case (g, r) => assert(math.abs(g.score - r.score) < 1e-9) }
    }
  }

  test("partitioned Koios and partitioned baseline agree") {
    val rng = new Random(151)
    for (_ <- 1 to 5) {
      val q = tiny.sets(rng.nextInt(tiny.sets.length)).tokens
      val params = KoiosParams(5, 0.8)
      val (a, _, _) = engines.runKoios(q.toSeq, params)
      val (b, _, _) = engines.runBaseline(q.toSeq, params)
      assert(a.map(_.score).zip(b.map(_.score)).forall { case (x, y) => math.abs(x - y) < 1e-9 })
    }
  }

  test("partitions cover the corpus exactly once") {
    val ids = engines.parts.flatMap(_.records.map(_.id))
    assert(ids.sorted == tiny.sets.map(_.id).sorted)
  }

  test("merged stats: counts summed, times are maxima") {
    val q = tiny.sets.head.tokens
    val (_, stats, wallMs) = engines.runKoios(q.toSeq, KoiosParams(3, 0.8))
    assert(stats.candidates == stats.iubPruned + stats.survivors)
    assert(wallMs > 0)
    assert(stats.refinementMs >= 0)
  }

  test("Agg averages exclude timed-out queries from time but counts them") {
    val ok = SearchStats(candidates = 10, survivors = 4, noEm = 4, refinementMs = 100)
    val bad = SearchStats(candidates = 99, timedOut = true, refinementMs = 9999)
    val agg = Agg.of(Seq((ok, 200.0), (bad, 60000.0)))
    assert(agg.queries == 2)
    assert(agg.timeouts == 1)
    assert(math.abs(agg.candidates - 10.0) < 1e-9)
    assert(math.abs(agg.responseSec - 0.2) < 1e-9)
  }

  test("Agg percentage helpers") {
    val s = SearchStats(candidates = 100, iubPruned = 90, survivors = 10,
      noEm = 5, emEarlyTerminated = 2, emComputed = 3)
    val agg = Agg.of(Seq((s, 10.0)))
    assert(math.abs(agg.iubPct - 90.0) < 1e-9)
    assert(math.abs(agg.noEmPct - 50.0) < 1e-9)
    assert(math.abs(agg.emEarlyPct - 20.0) < 1e-9)
  }

  test("Report writes bench_results files") {
    Report.emit("selftest", Seq("hello", "world"))
    val f = new java.io.File("/root/repo/bench_results/selftest.txt")
    assert(f.exists)
    val src = scala.io.Source.fromFile(f)
    try assert(src.mkString == "hello\nworld\n") finally src.close()
    f.delete()
  }
}
