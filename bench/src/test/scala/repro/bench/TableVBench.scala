package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Report, TableRuns}

/** Table V — WDC pruning counts per query-cardinality interval. Same shape
  * targets as Table IV on the hot-token (long-posting-list) corpus: more
  * candidates than OpenData overall, iUB pruning fraction rising with query
  * cardinality.
  */
class TableVBench extends AnyFunSuite {

  test("Table V: WDC #sets pruned by filters per interval") {
    val (lines, perInterval) = TableRuns.tableV()
    Report.emit("table5", lines)

    val cands = perInterval.map(_._2.candidates)
    assert(cands.last > cands.head,
      s"candidates do not grow with cardinality: $cands")
    val iubFrac = perInterval.map { case (_, a) =>
      if (a.candidates == 0) 0.0 else a.iubPruned / a.candidates
    }
    assert(iubFrac.last > iubFrac.head * 0.8,
      s"iUB pruning power does not hold up for large queries: $iubFrac")
    perInterval.foreach { case (label, a) =>
      assert(math.abs(a.candidates - a.iubPruned - a.survivors) < 1e-6, s"$label accounting")
      assert(math.abs(a.noEm + a.emEarly + a.em - a.survivors) < 1e-6, s"$label survivors")
    }
  }
}
