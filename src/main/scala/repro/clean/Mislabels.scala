package repro.clean

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.Method
import repro.data.DataSpec

/** Mislabel cleaning (paper §3.1.5): mislabels are injected, so ground
  * truth is known — detection is "ground truth" and repair flips the label
  * back (label := label_gt).
  */
object Mislabels extends Cleaner {
  val method = Method("ground_truth", "flip")

  def fix(df: DataFrame): DataFrame = df.withColumn("label", col("label_gt"))

  def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) =
    (fix(train), fix(test))
}
