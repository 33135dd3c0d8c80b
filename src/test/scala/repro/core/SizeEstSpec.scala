package repro.core

import org.scalatest.funsuite.AnyFunSuite

class SizeEstSpec extends AnyFunSuite {

  test("string estimate grows with length") {
    assert(SizeEst.ofString("ab") < SizeEst.ofString("abcdefgh"))
    assert(SizeEst.ofString("") == 40L)
  }

  test("token stream estimate is linear in buffered pairs") {
    assert(SizeEst.ofTokenStream(0) == 0L)
    assert(SizeEst.ofTokenStream(100) == 2 * SizeEst.ofTokenStream(50))
  }

  test("edge cache estimate counts tokens and edges") {
    val small: collection.Map[String, Array[(Int, Double)]] =
      Map("t" -> Array((0, 0.9)))
    val large: collection.Map[String, Array[(Int, Double)]] =
      Map("t" -> Array((0, 0.9), (1, 0.8)), "u" -> Array((0, 0.85)))
    assert(SizeEst.ofEdgeCache(small) > 0)
    assert(SizeEst.ofEdgeCache(large) > SizeEst.ofEdgeCache(small))
  }

  test("candidate estimate grows with count and query length") {
    assert(SizeEst.ofCandidates(100, 50, 8.0) > SizeEst.ofCandidates(10, 50, 8.0))
    assert(SizeEst.ofCandidates(100, 500, 8.0) > SizeEst.ofCandidates(100, 50, 8.0))
  }

  test("post-processing estimate grows with survivors and k") {
    assert(SizeEst.ofPostProcessing(10, 1000) > SizeEst.ofPostProcessing(10, 10))
    assert(SizeEst.ofPostProcessing(100, 10) > SizeEst.ofPostProcessing(10, 10))
  }
}
