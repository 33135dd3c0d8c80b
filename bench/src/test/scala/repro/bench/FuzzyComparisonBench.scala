package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import repro.harness.{Report, TableRuns}

/** §VIII-B (text experiment) — Koios vs the SilkMoth adaptations under
  * 3-gram Jaccard. Paper shape: Koios 72 s < SilkMoth-syntactic 141 s <
  * SilkMoth-semantic 400 s (timed out); i.e. Koios wins, and the generic
  * semantic variant is the slowest.
  */
class FuzzyComparisonBench extends AnyFunSuite {

  test("Fuzzy search comparison (Koios vs SilkMoth variants)") {
    val (lines, (koiosSec, synSec, semSec)) = TableRuns.fuzzyComparison()
    Report.emit("fuzzy_comparison", lines)

    assert(koiosSec > 0)
    // Shape: Koios is the fastest; the filterless semantic variant is the
    // slowest (it verifies every candidate).
    assert(koiosSec <= synSec * 1.2 + 0.05,
      s"Koios $koiosSec s not competitive with SilkMoth-syntactic $synSec s")
    assert(synSec <= semSec * 1.2 + 0.05,
      s"syntactic $synSec s should not be slower than semantic $semSec s")
  }
}
