package repro.clean

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._

import repro.core.Method
import repro.data.DataSpec

/** Duplicate cleaning (paper §3.1.3): detection by key collision on the
  * dataset's entity-key attribute; repair keeps the first record (smallest
  * rid) of each key group and deletes the rest. Train and test sets are
  * deduplicated independently.
  */
object Duplicates extends Cleaner {
  val method = Method("key_collision", "delete")

  def dedup(spec: DataSpec, df: DataFrame): DataFrame = {
    val key = spec.keyCol.getOrElse(sys.error(s"${spec.name} has no key column"))
    val w   = Window.partitionBy(col(key)).orderBy(col("rid"))
    df.withColumn("__rn", row_number().over(w))
      .filter(col("__rn") === 1)
      .drop("__rn")
  }

  def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) =
    (dedup(spec, train), dedup(spec, test))
}
