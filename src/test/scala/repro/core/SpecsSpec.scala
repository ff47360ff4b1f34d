package repro.core

import org.scalatest.funsuite.AnyFunSuite

import repro.core.ErrorType._

/** Validates that the benchmark grid has exactly the paper's hypothesis
  * space: |R1| = 1330, |R2| = 190, |R3| = 50 specifications, i.e. the
  * 3990 / 570 / 150 hypotheses of §4.3 at three t-tests each.
  */
class SpecsSpec extends AnyFunSuite {

  test("R1 has 1330 specifications (paper: 3990 hypotheses / 3 tests)") {
    assert(Specs.r1().size == 1330)
  }

  test("R2 has 190 specifications (paper: 570 / 3)") {
    assert(Specs.r2().size == 190)
  }

  test("R3 has 50 specifications (paper: 150 / 3)") {
    assert(Specs.r3().size == 50)
  }

  test("R1 per-error counts match the Table 15 Q1 denominators") {
    val byError = Specs.r1().groupBy(_.error).view.mapValues(_.size).toMap
    assert(byError("outliers") == 840)        // 5 ds × 12 methods × 2 scen × 7 models
    assert(byError("missing_values") == 252)  // 6 ds × 6 imputers × 1 scen × 7
    assert(byError("mislabels") == 126)       // 9 variants × 1 × 2 × 7
    assert(byError("duplicates") == 56)       // 4 ds × 1 × 2 × 7
    assert(byError("inconsistencies") == 56)  // 4 ds × 1 × 2 × 7
  }

  test("R2 per-error counts") {
    val byError = Specs.r2().groupBy(_.error).view.mapValues(_.size).toMap
    assert(byError("outliers") == 120)
    assert(byError("missing_values") == 36)
    assert(byError("mislabels") == 18)
    assert(byError("duplicates") == 8)
    assert(byError("inconsistencies") == 8)
  }

  test("R3 per-error counts") {
    val byError = Specs.r3().groupBy(_.error).view.mapValues(_.size).toMap
    assert(byError("outliers") == 10)
    assert(byError("missing_values") == 6)
    assert(byError("mislabels") == 18)
    assert(byError("duplicates") == 8)
    assert(byError("inconsistencies") == 8)
  }

  test("missing values are BD-only; other errors have both scenarios") {
    assert(Specs.scenariosFor(MissingValues) == Seq(Scenario.BD))
    assert(Specs.scenariosFor(Outliers) == Seq(Scenario.BD, Scenario.CD))
    assert(Specs.r1().filter(_.error == "missing_values").forall(_.scenario == "BD"))
  }

  test("mislabel specs use variant dataset names") {
    val ml = Specs.r3(errors = Set(Mislabels))
    assert(ml.map(_.dataset).toSet == Set(
      "EEG_uniform", "EEG_major", "EEG_minor",
      "KDD_uniform", "KDD_major", "KDD_minor",
      "USCensus_uniform", "USCensus_major", "USCensus_minor"))
  }

  test("specs are unique") {
    val r1 = Specs.r1()
    assert(r1.distinct.size == r1.size)
  }

  test("filtering by error type slices the grid") {
    assert(Specs.r1(errors = Set(Duplicates)).size == 56)
    assert(Specs.cells(Set(Duplicates)).size == 4)
    assert(Specs.cells(Set(Mislabels)).size == 9)
  }
}
