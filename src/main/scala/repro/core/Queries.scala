package repro.core

import org.apache.spark.sql.DataFrame

/** The analysis SQL of paper §2.2 — Q1..Q5 group-by-flag queries over a
  * relation. The SQL strings are shared with the DuckDB oracle in tests so
  * Spark's aggregation is cross-checked row-for-row.
  */
object Queries {

  def q1Sql(view: String, e: String): String =
    s"""SELECT flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY flag""".stripMargin

  def q2Sql(view: String, e: String): String =
    s"""SELECT scenario, flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY scenario, flag""".stripMargin

  /** Q3 is only applicable to R1 (R2/R3 have no model attribute). */
  def q3Sql(view: String, e: String): String =
    s"""SELECT model, flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY model, flag""".stripMargin

  /** Q4.1/Q4.2 apply to error types with more than one cleaning method. */
  def q41Sql(view: String, e: String): String =
    s"""SELECT detect AS detect_method, flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY detect, flag""".stripMargin

  def q42Sql(view: String, e: String): String =
    s"""SELECT repair AS repair_method, flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY repair, flag""".stripMargin

  def q5Sql(view: String, e: String): String =
    s"""SELECT dataset, flag, COUNT(*) AS cnt
       |FROM $view WHERE error_type = '$e'
       |GROUP BY dataset, flag""".stripMargin

  /** Run a query against a relation DataFrame via a temp view. */
  def run(relation: DataFrame, sql: String, view: String): DataFrame = {
    relation.createOrReplaceTempView(view)
    relation.sparkSession.sql(sql)
  }
}
