package repro.jobs

import repro.core.Walkthrough

/** Reproduces paper Tables 6–9: the s1/s2/s3 worked example on one split
  * (spec listing, s1 metric pair, the all-model table, the all-method table).
  */
object Tables06to09 {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.build("cleanml-tables-06-09")
    Walkthrough.tables6to9(spark)
    spark.stop()
  }
}
