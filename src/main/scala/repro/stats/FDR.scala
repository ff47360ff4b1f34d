package repro.stats

/** Multiple-hypothesis-testing corrections (paper §4.3).
  *
  * Each procedure returns *adjusted* p-values in the input order; a
  * hypothesis is rejected at FDR/FWER level alpha iff its adjusted p-value
  * is < alpha. The paper employs Benjamini–Yekutieli because it controls
  * the FDR under arbitrary dependence; Bonferroni and Benjamini–Hochberg
  * are provided for comparison and testing.
  */
object FDR {

  /** Bonferroni: adjusted p = min(1, m * p). */
  def bonferroni(p: Seq[Double]): Seq[Double] = {
    val m = p.size
    p.map(x => math.min(1.0, m * x))
  }

  /** Benjamini–Hochberg step-up adjusted p-values. */
  def benjaminiHochberg(p: Seq[Double]): Seq[Double] = stepUp(p, 1.0)

  /** Benjamini–Yekutieli: BH with the harmonic-sum penalty c(m) = sum 1/i. */
  def benjaminiYekutieli(p: Seq[Double]): Seq[Double] = {
    val m = p.size
    val cm = (1 to m).map(1.0 / _).sum
    stepUp(p, cm)
  }

  /** Shared step-up machinery: adj_(i) = min_{j>=i} min(1, scale*m*p_(j)/j). */
  private def stepUp(p: Seq[Double], scale: Double): Seq[Double] = {
    val m = p.size
    if (m == 0) return Seq.empty
    // (p-value, original index), sorted ascending by p.
    val sorted = p.zipWithIndex.sortBy(_._1)
    val raw = sorted.zipWithIndex.map { case ((pv, orig), rank) =>
      (orig, math.min(1.0, scale * m * pv / (rank + 1)))
    }
    // Enforce monotonicity from the largest rank downward.
    val adjusted = new Array[Double](m)
    var runningMin = 1.0
    var i = m - 1
    while (i >= 0) {
      val (orig, v) = raw(i)
      runningMin = math.min(runningMin, v)
      adjusted(orig) = runningMin
      i -= 1
    }
    adjusted.toSeq
  }
}
