package repro.bench

import repro.core.ErrorType

/** Paper Table 15, E = outliers. Paper shape: mostly S/P (R1: 31.5% P /
  * 57.0% S / 11.4% N); negatives concentrate in Credit/KDD (genuine heavy
  * tails); SD is more conservative than IQR/IF; KNN benefits the most;
  * model selection shrinks the negative share.
  */
class Table15OutliersBench extends Table15Bench {
  def error: ErrorType = ErrorType.Outliers

  test("Q1 shape: mostly insignificant or positive, some negative") {
    val c = flagCounts(rel.r1)
    assert(share(c, "P") + share(c, "S") >= 0.55, s"P+S share: $c")
  }

  test("Q5 shape: negative flags concentrate in Credit and KDD") {
    val nAll = flagCounts(rel.r1)("N")
    if (nAll > 0) {
      val nGenuine = flagCounts(rel.r1, "dataset IN ('Credit','KDD')")("N")
      assert(nGenuine.toDouble / nAll >= 0.5,
        s"negatives not from the genuine-tail datasets: $nGenuine of $nAll")
    }
  }

  test("corruption datasets benefit: EEG/Sensor have positive mean diffs") {
    val d = meanDiff("dataset IN ('EEG','Sensor')")
    assert(d > 0.0, s"EEG/Sensor mean diff = $d")
  }

  test("Credit cleaning destroys genuine signal (negative mean diff, CD)") {
    val d = meanDiff("dataset = 'Credit' AND scenario = 'CD' AND detect <> 'SD'")
    assert(d < 0.005, s"Credit CD mean diff = $d")
  }

  test("Q4.1 shape: SD is more conservative than IQR (fewer P and N flags)") {
    val sd  = flagCounts(rel.r1, "detect = 'SD'")
    val iqr = flagCounts(rel.r1, "detect = 'IQR'")
    assert(sd("P") + sd("N") <= iqr("P") + iqr("N") + 8,
      s"SD should move fewer flags than IQR: sd=$sd iqr=$iqr")
  }

  test("Q3 shape: KNN gains at least as much as the average model") {
    val byModel = cfg.models.map(m => m -> flagCounts(rel.r1, s"model = '$m'")("P"))
    val knn = byModel.toMap.apply("knn")
    val avg = byModel.map(_._2).sum.toDouble / byModel.size
    assert(knn >= avg * 0.8, s"KNN P=$knn, avg=$avg ($byModel)")
  }

  test("model selection does not increase the negative share (R1 -> R2)") {
    val n1 = share(flagCounts(rel.r1), "N")
    val n2 = share(flagCounts(rel.r2), "N")
    assert(n2 <= n1 + 0.08, s"R1 N=$n1 R2 N=$n2")
  }
}
