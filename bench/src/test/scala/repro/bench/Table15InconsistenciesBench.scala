package repro.bench

import repro.core.ErrorType

/** Paper Table 15, E = inconsistencies. Paper shape: no negative flags,
  * S dominates (R1: 14.3% P / 85.7% S / 0% N); positive flags concentrate
  * in Movie (48% inconsistency on the dominant feature).
  */
class Table15InconsistenciesBench extends Table15Bench {
  def error: ErrorType = ErrorType.Inconsistencies

  test("Q1 shape: cleaning inconsistencies is never clearly negative") {
    val c = flagCounts(rel.r1)
    assert(share(c, "N") <= 0.12, s"N share: $c")
  }

  test("Q1 shape: insignificant flags dominate") {
    val c = flagCounts(rel.r1)
    assert(share(c, "S") >= 0.4, s"S share: $c")
  }

  test("Q5 shape: Movie (48% rate, fragmented dominant feature) gains most") {
    val movieP = flagCounts(rel.r1, "dataset = 'Movie'")("P")
    val othersP = Seq("Company", "Restaurant", "University")
      .map(d => flagCounts(rel.r1, s"dataset = '$d'")("P"))
    assert(othersP.forall(movieP >= _), s"Movie P=$movieP others=$othersP")
  }

  test("Movie mean diff is positive (merging consolidates one-hot columns)") {
    val d = meanDiff("dataset = 'Movie'")
    assert(d > 0.0, s"Movie mean diff = $d")
  }

  test("low-rate weakly-predictive datasets stay insignificant") {
    val c = flagCounts(rel.r1, "dataset IN ('Company','University')")
    assert(share(c, "S") >= 0.5, s"Company/University flags: $c")
  }
}
