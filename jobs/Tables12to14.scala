package repro.jobs

import repro.core.Walkthrough

/** Reproduces paper Tables 12–14: the 20-split metric pairs for s1, the
  * three paired t-tests, and the BY-corrected p-values with the final flag.
  */
object Tables12to14 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("cleanml-tables-12-14")
    val splits = if (args.nonEmpty) args(0).toInt else 20
    Walkthrough.tables12to14(spark, splits)
    spark.stop()
  }
}
