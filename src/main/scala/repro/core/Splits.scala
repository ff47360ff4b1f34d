package repro.core

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Deterministic dataset splitting. The paper splits 70/30 at random with
  * per-split seeds (§4.1 step 1, §4.2.2); we realize each seeded split as a
  * hash bucket of the row id so it is reproducible across runs and engines.
  */
object Splits {

  /** 70/30 train/test split for a given split seed. */
  def trainTest(df: DataFrame, splitSeed: Int): (DataFrame, DataFrame) = {
    val bucket = pmod(xxhash64(col("rid"), lit(splitSeed)), lit(100))
    (df.filter(bucket < 70), df.filter(bucket >= 70))
  }

  /** 80/20 sub-train/validation split inside a training arm (stands in for
    * the paper's 5-fold CV; selection semantics unchanged — DESIGN.md §1).
    */
  def subVal(df: DataFrame, salt: Int): (DataFrame, DataFrame) = {
    val bucket = pmod(xxhash64(col("rid"), lit(salt), lit("validation")), lit(100))
    (df.filter(bucket < 80), df.filter(bucket >= 80))
  }
}
