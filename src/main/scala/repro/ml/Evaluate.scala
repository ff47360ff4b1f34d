package repro.ml

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Evaluation metrics (paper §4.1 step 4): accuracy for balanced datasets,
  * F1 of the minority (positive) class for class-imbalanced ones.
  */
object Evaluate {

  /** Compute `metric` ("acc" | "f1") from a predictions DataFrame carrying
    * `label` and `prediction` columns.
    */
  def score(pred: DataFrame, metric: String): Double = metric match {
    case "acc" => accuracy(pred)
    case "f1"  => f1(pred)
    case other => sys.error(s"unknown metric: $other")
  }

  def accuracy(pred: DataFrame): Double = {
    // sum() over an empty frame is NULL — coalesce keeps the metric total.
    val row = pred.agg(
      coalesce(sum(when(col("prediction") === col("label"), 1L).otherwise(0L)), lit(0L)),
      count(lit(1))).head()
    val n = row.getLong(1)
    if (n == 0) 0.0 else row.getLong(0).toDouble / n
  }

  /** F1 of class 1.0 (the minority class in our imbalanced analogs). */
  def f1(pred: DataFrame): Double = {
    val row = pred.agg(
      coalesce(sum(when(col("prediction") === 1.0 && col("label") === 1.0, 1L).otherwise(0L)), lit(0L)),
      coalesce(sum(when(col("prediction") === 1.0 && col("label") === 0.0, 1L).otherwise(0L)), lit(0L)),
      coalesce(sum(when(col("prediction") === 0.0 && col("label") === 1.0, 1L).otherwise(0L)), lit(0L))).head()
    val tp = row.getLong(0).toDouble
    val fp = row.getLong(1).toDouble
    val fn = row.getLong(2).toDouble
    if (tp == 0.0) 0.0
    else {
      val p = tp / (tp + fp)
      val r = tp / (tp + fn)
      2 * p * r / (p + r)
    }
  }
}
