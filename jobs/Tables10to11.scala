package repro.jobs

import repro.core.Walkthrough

/** Reproduces paper Tables 10–11: aggregation over five random-search seeds
  * for s1 (mean pair) and s2 (best-validation pair).
  */
object Tables10to11 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("cleanml-tables-10-11")
    Walkthrough.tables10to11(spark)
    spark.stop()
  }
}
