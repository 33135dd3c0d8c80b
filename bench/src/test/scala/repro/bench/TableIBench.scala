package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{BenchSuite, Report, TableRuns}

/** Table I — dataset characteristics of the four lite profiles vs the paper's
  * corpora. The profiles are ~50–100× smaller by design; the *shape*
  * (relative sizes, cardinality skew, vocabulary proportions) must match.
  */
class TableIBench extends AnyFunSuite {

  test("Table I: dataset characteristics") {
    val lines = TableRuns.tableI()
    Report.emit("table1", lines)

    val byName = BenchSuite.datasets.toMap
    // Shape: WDC is the largest corpus, Twitter has the smallest sets,
    // DBLP the largest average sets — as in the paper's Table I.
    val sizes = BenchSuite.datasets.map { case (n, d) => n -> d.sets.length }.toMap
    assert(sizes("WDC") > sizes("Twitter") && sizes("Twitter") > sizes("OpenData") &&
      sizes("OpenData") > sizes("DBLP"))
    val avg = BenchSuite.datasets.map { case (n, d) => n -> d.avgSize }.toMap
    assert(avg("DBLP") > avg("OpenData") && avg("OpenData") > avg("Twitter"))
    // OpenData/WDC cardinalities are heavily skewed (max ≫ avg).
    assert(byName("OpenData").maxSize > 5 * avg("OpenData"))
    assert(byName("WDC").maxSize > 5 * avg("WDC"))
    // OpenData has the largest vocabulary of the lite profiles relative to
    // WDC's hot-token design (smaller vocab → longer posting lists).
    assert(byName("OpenData").uniqueElements > byName("WDC").uniqueElements)
  }
}
