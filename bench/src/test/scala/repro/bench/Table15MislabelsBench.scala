package repro.bench

import repro.core.ErrorType

/** Paper Table 15, E = mislabels. Paper shape: P dominates (R1: 59.5% P /
  * 26.2% S / 14.3% N); CD is more strongly positive than BD; BD has no
  * negative flags.
  */
class Table15MislabelsBench extends Table15Bench {
  def error: ErrorType = ErrorType.Mislabels

  test("Q1 shape: cleaning mislabels is predominantly positive") {
    val c = flagCounts(rel.r1)
    assert(share(c, "P") >= 0.35, s"P share too low: $c")
    assert(c("P") > c("N"), s"P should dominate N: $c")
  }

  test("Q2 shape: CD is strongly positive (dirty test labels cap accuracy)") {
    val cd = flagCounts(rel.r1, "scenario = 'CD'")
    assert(share(cd, "P") >= 0.5, s"CD P share: $cd")
  }

  test("Q2 shape: BD has few or no negative flags") {
    val bd = flagCounts(rel.r1, "scenario = 'BD'")
    assert(share(bd, "N") <= 0.15, s"BD N share: $bd")
  }

  test("CD improvement magnitude ~ the injected 5% noise rate") {
    val d = meanDiff("scenario = 'CD' AND dataset LIKE '%uniform%'")
    assert(d > 0.015 && d < 0.12, s"CD mean diff = $d")
  }

  test("model/method selection keeps the positive impact (R2/R3)") {
    for (r <- Seq(rel.r2, rel.r3)) {
      val c = flagCounts(r)
      assert(c("P") >= c("N"), s"selection lost the positive impact: $c")
    }
  }
}
