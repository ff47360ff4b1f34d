package repro.clean

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

import repro.core.Method
import repro.data.DataSpec

/** Missing-value cleaning (paper §3.1.1).
  *
  * Detection: empty/NaN entries (we normalize to SQL NULL at injection).
  * Repairs: row deletion, or one of six imputation combos — numeric
  * {mean, median, mode} × categorical {mode, dummy "missing" category}.
  * Imputation statistics come from the training set only.
  */
object MissingValues {

  val DummyCategory = "missing"

  /** Count of missing feature cells (used by tests and diagnostics). */
  def missingCellCount(spec: DataSpec, df: DataFrame): Long = {
    val exprs = spec.featureCols.map(c =>
      sum(when(col(c).isNull, 1L).otherwise(0L)))
    val row = df.agg(exprs.head, exprs.tail: _*).head()
    (0 until spec.featureCols.size).map(row.getLong).sum
  }

  /** Deletion repair: drop any record with a missing feature value. */
  object Deletion extends Cleaner {
    val method = Method("empty_entry", "delete")
    def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) =
      (train.na.drop(spec.featureCols), test.na.drop(spec.featureCols))
  }

  /** The six imputation repairs, named `<numeric>_<categorical>` as in
    * paper Table 2 (e.g. "mean_dummy" = numeric mean + categorical dummy).
    */
  val imputers: Seq[Cleaner] =
    for {
      num <- Seq("mean", "median", "mode")
      cat <- Seq("mode", "dummy")
    } yield new Imputer(num, cat)

  def imputer(num: String, cat: String): Cleaner = new Imputer(num, cat)

  private final class Imputer(numStat: String, catStat: String) extends Cleaner {
    val method = Method("empty_entry", s"${numStat}_$catStat")

    def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) = {
      val numFill: Map[String, Double] = spec.numeric.map { c =>
        c -> numericStat(train, c, numStat)
      }.toMap
      val catFill: Map[String, String] = spec.categorical.map { c =>
        c -> (if (catStat == "dummy") DummyCategory else stringMode(train, c))
      }.toMap
      val textFill: Map[String, String] = spec.text.map(_ -> "").toMap

      def fill(df: DataFrame): DataFrame =
        df.na.fill(numFill).na.fill(catFill ++ textFill)
      (fill(train), fill(test))
    }
  }

  /** Train-side numeric statistic; mode ties break to the smallest value. */
  def numericStat(train: DataFrame, c: String, stat: String): Double = stat match {
    case "mean" =>
      Option(train.agg(avg(col(c))).head().get(0)).map(_.asInstanceOf[Double]).getOrElse(0.0)
    case "median" =>
      Option(train.agg(expr(s"percentile(`$c`, 0.5)")).head().get(0))
        .map(_.asInstanceOf[Double]).getOrElse(0.0)
    case "mode" =>
      val top = train.filter(col(c).isNotNull)
        .groupBy(col(c)).count()
        .orderBy(desc("count"), asc(c))
        .head(1)
      if (top.isEmpty) 0.0 else top(0).getDouble(0)
    case other => sys.error(s"unknown numeric imputation: $other")
  }

  /** Train-side most frequent category; ties break lexicographically. */
  def stringMode(train: DataFrame, c: String): String = {
    val top = train.filter(col(c).isNotNull)
      .groupBy(col(c)).count()
      .orderBy(desc("count"), asc(c))
      .head(1)
    if (top.isEmpty) DummyCategory else top(0).getString(0)
  }

  /** Boolean column: row has at least one missing feature cell. */
  def anyMissing(spec: DataSpec): Column =
    spec.featureCols.map(col(_).isNull).reduce(_ || _)
}
