package repro.clean

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.core.Method
import repro.data.DataSpec

/** Numerical-outlier cleaning (paper §3.1.2).
  *
  * Detectors (fit on the training set, applied to both sets):
  *   - SD:  cell outside mean ± 3·stddev of its attribute
  *   - IQR: cell outside [Q1 - 1.5·IQR, Q3 + 1.5·IQR] (exact percentiles)
  *   - IF:  isolation-forest score above the 99th training percentile
  *          (contamination = 0.01, per attribute)
  * Repairs: delete the record, or impute the cell with the mean / median /
  * mode of the attribute's NON-flagged training values.
  */
object Outliers {

  val Detectors: Seq[String] = Seq("SD", "IQR", "IF")
  val Repairs: Seq[String]   = Seq("delete", "impute_mean", "impute_median", "impute_mode")

  /** Per-column cell-level flag expressions, fit on `train`. */
  def fitDetector(detect: String, train: DataFrame, cols: Seq[String],
                  seed: Long = 0L): Map[String, Column => Column] = detect match {
    case "SD" =>
      val aggs = cols.flatMap(c => Seq(avg(col(c)), stddev_samp(col(c))))
      val row  = train.agg(aggs.head, aggs.tail: _*).head()
      cols.zipWithIndex.map { case (c, i) =>
        val m  = row.getDouble(2 * i)
        val sd = Option(row.get(2 * i + 1)).map(_.asInstanceOf[Double]).getOrElse(0.0)
        val (lo, hi) = (m - 3.0 * sd, m + 3.0 * sd)
        c -> ((v: Column) => v.isNotNull && (v < lo || v > hi))
      }.toMap
    case "IQR" =>
      val aggs = cols.map(c => expr(s"percentile(`$c`, array(0.25, 0.75))"))
      val row  = train.agg(aggs.head, aggs.tail: _*).head()
      cols.zipWithIndex.map { case (c, i) =>
        val qs = row.getSeq[Double](i)
        val iqr = qs(1) - qs(0)
        val (lo, hi) = (qs(0) - 1.5 * iqr, qs(1) + 1.5 * iqr)
        c -> ((v: Column) => v.isNotNull && (v < lo || v > hi))
      }.toMap
    case "IF" =>
      cols.map { c =>
        val values = train.select(col(c)).filter(col(c).isNotNull)
          .collect().map(_.getDouble(0))
        val forest = IsolationForest.fit(values, numTrees = 50,
          sampleSize = 256, seed = seed ^ c.hashCode.toLong)
        val thr = IsolationForest.threshold(forest, values, contamination = 0.01)
        val flagUdf = udf((v: Double) => forest.score(v) > thr)
        c -> ((v: Column) => v.isNotNull && flagUdf(v))
      }.toMap
    case other => sys.error(s"unknown outlier detector: $other")
  }

  /** All 12 detector × repair cleaners. */
  val cleaners: Seq[Cleaner] =
    for (d <- Detectors; r <- Repairs) yield new OutlierCleaner(d, r)

  def cleaner(detect: String, repair: String): Cleaner = new OutlierCleaner(detect, repair)

  private final class OutlierCleaner(detect: String, repair: String) extends Cleaner {
    val method = Method(detect, repair)

    def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) = {
      val cols  = spec.outlierCols
      require(cols.nonEmpty, s"${spec.name} has no outlier columns")
      val flags = fitDetector(detect, train, cols)
      repair match {
        case "delete" =>
          val anyFlag = cols.map(c => flags(c)(col(c))).reduce(_ || _)
          (train.filter(!anyFlag), test.filter(!anyFlag))
        case rep =>
          val stat = rep.stripPrefix("impute_")
          // Imputation value = statistic of the attribute's non-flagged
          // training cells.
          val fill: Map[String, Double] = cols.map { c =>
            val inliers = train.filter(!flags(c)(col(c)))
            c -> MissingValues.numericStat(inliers, c, stat)
          }.toMap
          def repaired(df: DataFrame): DataFrame =
            cols.foldLeft(df) { (d, c) =>
              d.withColumn(c, when(flags(c)(col(c)), lit(fill(c))).otherwise(col(c)))
            }
          (repaired(train), repaired(test))
      }
    }
  }

  /** Fraction of flagged cells (diagnostics and tests). */
  def flaggedCellRate(detect: String, train: DataFrame, df: DataFrame,
                      cols: Seq[String]): Double = {
    val flags = fitDetector(detect, train, cols)
    val exprs = cols.map(c => sum(when(flags(c)(col(c)), 1L).otherwise(0L)))
    val row = df.agg(exprs.head, exprs.tail: _*).head()
    val flagged = cols.indices.map(row.getLong).sum.toDouble
    flagged / (df.count().toDouble * cols.size)
  }
}
