package repro.clean

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

import repro.core.Method
import repro.data.DataSpec

/** Inconsistency cleaning (paper §3.1.4) — an automated stand-in for the
  * paper's interactive OpenRefine workflow, using OpenRefine's default
  * *fingerprint key-collision* clustering: lowercase, strip punctuation,
  * tokenize, sort + dedup tokens, rejoin. Values sharing a fingerprint are
  * merged to the cluster's most frequent raw representation (ties break
  * lexicographically). The fingerprint→canonical map is built on the
  * training set and applied to both sets; unseen test values are resolved
  * through their own fingerprint.
  */
object Inconsistencies extends Cleaner {
  val method = Method("openrefine", "merge")

  /** OpenRefine's fingerprint keying function. */
  def fingerprint(s: String): String =
    s.toLowerCase
      .replaceAll("[^a-z0-9]+", " ")
      .trim
      .split("\\s+")
      .filter(_.nonEmpty)
      .distinct
      .sorted
      .mkString(" ")

  /** fingerprint -> canonical raw value, from training-set frequencies. */
  def canonicalMap(train: DataFrame, column: String): Map[String, String] = {
    val counts = train.filter(col(column).isNotNull)
      .groupBy(col(column)).count()
      .collect()
      .map(r => (r.getString(0), r.getLong(1)))
    counts.groupBy { case (v, _) => fingerprint(v) }
      .map { case (fp, members) =>
        val canonical = members.maxBy { case (v, n) => (n, v) }(
          Ordering.Tuple2(Ordering.Long, Ordering.String.reverse))._1
        fp -> canonical
      }
  }

  def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame) = {
    val column = spec.inconsCol.getOrElse(sys.error(s"${spec.name} has no inconsistency column"))
    val map = canonicalMap(train, column)
    val mergeUdf = udf { (v: String) =>
      if (v == null) null else map.getOrElse(fingerprint(v), v)
    }
    def merge(df: DataFrame): DataFrame = df.withColumn(column, mergeUdf(col(column)))
    (merge(train), merge(test))
  }
}
