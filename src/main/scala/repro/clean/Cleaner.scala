package repro.clean

import org.apache.spark.sql.DataFrame

import repro.core.Method
import repro.data.DataSpec

/** A cleaning method = detection + repair (paper Table 2), expressed as a
  * DataFrame transform over a (train, test) pair.
  *
  * Contract: all statistics needed for detection or repair (means,
  * quantiles, modes, isolation forests, fingerprint→canonical maps) are
  * computed on the TRAINING set only and applied to both sets — the
  * paper's anti-leakage rule (§4.1 step 2).
  */
trait Cleaner extends Serializable {
  def method: Method

  /** Returns (cleanTrain, cleanTest). */
  def clean(spec: DataSpec, train: DataFrame, test: DataFrame): (DataFrame, DataFrame)
}
