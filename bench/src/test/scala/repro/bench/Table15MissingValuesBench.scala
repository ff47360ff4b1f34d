package repro.bench

import repro.core.ErrorType

/** Paper Table 15, E = missing values. Paper shape: imputation mostly beats
  * or matches deletion (R1: 61.5% P / 34.9% S / 3.6% N); the negative flags
  * concentrate in USCensus; imputation methods are interchangeable.
  */
class Table15MissingValuesBench extends Table15Bench {
  def error: ErrorType = ErrorType.MissingValues

  test("Q1 shape: imputation mostly beats or matches deletion") {
    val c = flagCounts(rel.r1)
    assert(share(c, "P") + share(c, "S") >= 0.6, s"P+S share: $c")
    assert(c("P") > c("N"), s"P should beat N overall: $c")
  }

  test("Q5 shape: USCensus (noise-coupled missingness) is the worst dataset") {
    val byDs = Seq("Airbnb", "Credit", "KDD", "Marketing", "Titanic", "USCensus")
      .map(d => d -> flagCounts(rel.r1, s"dataset = '$d'"))
    val usN = byDs.toMap.apply("USCensus")("N")
    val otherMaxN = byDs.filter(_._1 != "USCensus").map(_._2("N")).max
    assert(usN >= otherMaxN, s"USCensus N=$usN, max other=$otherMaxN ($byDs)")
  }

  test("USCensus mean diff (imputation - deletion) is the lowest") {
    val us = meanDiff("dataset = 'USCensus'")
    val others = Seq("Titanic", "Marketing", "KDD").map(d => meanDiff(s"dataset = '$d'"))
    assert(others.forall(us <= _ + 1e-9), s"USCensus=$us others=$others")
  }

  test("small MAR datasets favor imputation (positive mean diffs)") {
    val d = meanDiff("dataset IN ('Titanic','Marketing')")
    assert(d > 0.0, s"Titanic/Marketing mean diff = $d")
  }

  test("Q4.2 shape: imputation methods are roughly interchangeable") {
    val shares = Seq("mean_mode", "median_mode", "mode_mode",
      "mean_dummy", "median_dummy", "mode_dummy")
      .map(m => share(flagCounts(rel.r1, s"repair = '$m'"), "P"))
    assert(shares.max - shares.min <= 0.6,
      s"imputation methods diverge too much: $shares")
  }

  test("missing values are BD-only (Table 5 semantics)") {
    assert(rel.r1.filter("scenario <> 'BD'").count() == 0)
  }
}
