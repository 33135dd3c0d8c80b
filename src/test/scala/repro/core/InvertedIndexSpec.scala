package repro.core

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class InvertedIndexSpec extends AnyFunSuite {

  private val records = IndexedSeq(
    SetRecord(10L, Array("a", "b", "c")),
    SetRecord(11L, Array("b", "d")),
    SetRecord(12L, Array("a", "d", "e")))

  test("postings contain exactly the sets holding each token") {
    val idx = InvertedIndex.build(records)
    assert(idx.get("a").toSeq == Seq(0, 2))
    assert(idx.get("b").toSeq == Seq(0, 1))
    assert(idx.get("d").toSeq == Seq(1, 2))
    assert(idx.get("e").toSeq == Seq(2))
  }

  test("unknown token has empty postings") {
    val idx = InvertedIndex.build(records)
    assert(idx.get("zzz").isEmpty)
    assert(!idx.contains("zzz"))
  }

  test("vocabulary is sorted and complete") {
    val idx = InvertedIndex.build(records)
    assert(idx.vocabulary.toSeq == Seq("a", "b", "c", "d", "e"))
    assert(idx.vocabularySize == 5)
  }

  test("totalPostings equals the aggregate set size Σ|C| (§VII-B)") {
    val idx = InvertedIndex.build(records)
    assert(idx.totalPostings == records.map(_.size).sum)
  }

  test("random corpus: membership equivalence") {
    val rng = new Random(40)
    val recs = IndexedSeq.tabulate(50) { i =>
      SetRecord(i.toLong, rng.shuffle((0 until 30).map(j => s"w$j")).take(1 + rng.nextInt(10)).toArray)
    }
    val idx = InvertedIndex.build(recs)
    for (t <- idx.vocabulary) {
      val expected = recs.indices.filter(i => recs(i).tokens.contains(t))
      assert(idx.get(t).toSeq == expected)
    }
  }

  test("empty repository") {
    val idx = InvertedIndex.build(IndexedSeq.empty)
    assert(idx.vocabularySize == 0)
    assert(idx.totalPostings == 0)
  }

  test("SetRecord deduplicates tokens") {
    val r = SetRecord(1L, Seq("x", "y", "x", "z", "y"))
    assert(r.tokens.toSeq == Seq("x", "y", "z"))
    assert(r.size == 3)
  }

  test("SetCollection rejects duplicate ids") {
    assertThrows[IllegalArgumentException] {
      new SetCollection(IndexedSeq(SetRecord(1L, Array("a")), SetRecord(1L, Array("b"))))
    }
  }
}
