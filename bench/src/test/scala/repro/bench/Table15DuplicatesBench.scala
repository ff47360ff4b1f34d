package repro.bench

import repro.core.ErrorType

/** Paper Table 15, E = duplicates. Paper shape: S dominates (R1: 17.9% P /
  * 71.4% S / 10.7% N); negatives persist in BD (minority-biased duplicates
  * act as useful extra samples) and concentrate in Movie/Restaurant.
  */
class Table15DuplicatesBench extends Table15Bench {
  def error: ErrorType = ErrorType.Duplicates

  test("Q1 shape: insignificant flags dominate") {
    val c = flagCounts(rel.r1)
    assert(share(c, "S") >= 0.35, s"S share: $c")
  }

  test("uniform exact duplicates (Airbnb/Citation) are near-neutral") {
    val c = flagCounts(rel.r1, "dataset IN ('Airbnb','Citation')")
    assert(share(c, "S") >= 0.5, s"Airbnb/Citation flags: $c")
  }

  test("Q5 shape: any negative flags concentrate in Movie/Restaurant (BD)") {
    val nAll = flagCounts(rel.r1)("N")
    if (nAll > 0) {
      val nBiased = flagCounts(rel.r1, "dataset IN ('Movie','Restaurant')")("N")
      assert(nBiased.toDouble / nAll >= 0.5, s"$nBiased of $nAll")
    }
  }

  test("Movie BD: dedup training does not clearly help (paper's negative pocket)") {
    val d = meanDiff("dataset = 'Movie' AND scenario = 'BD'")
    assert(d < 0.02, s"Movie BD mean diff = $d")
  }

  test("CD stays mild: dedup of the test set moves metrics little") {
    val d = math.abs(meanDiff("scenario = 'CD'"))
    assert(d < 0.05, s"CD |mean diff| = $d")
  }
}
