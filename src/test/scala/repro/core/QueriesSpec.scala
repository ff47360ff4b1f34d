package repro.core

import org.apache.spark.sql.DataFrame

import repro.{Oracle, SparkSpec}

class QueriesSpec extends SparkSpec {

  import spark.implicits._

  /** A small synthetic R1 relation with known flag distributions. */
  private lazy val relation: DataFrame = {
    val rng = new scala.util.Random(4)
    val rows = for {
      ds <- Seq("EEG", "Sensor", "Credit")
      detect <- Seq("SD", "IQR", "IF")
      repair <- Seq("delete", "impute_mean")
      model <- Seq("knn", "xgboost")
      scen <- Seq("BD", "CD")
    } yield {
      val flag = if (ds == "Credit" && detect != "SD") "N"
                 else if (ds == "EEG") "P" else Seq("P", "S")(rng.nextInt(2))
      (ds, "outliers", detect, repair, model, scen, flag)
    }
    rows.toDF("dataset", "error_type", "detect", "repair", "model", "scenario", "flag")
      .cache()
  }

  test("Q1 matches DuckDB (oracle-checked)") {
    val got = Queries.run(relation, Queries.q1Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got,
      "SELECT flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY flag",
      "r" -> relation)
  }

  test("Q2 matches DuckDB (oracle-checked)") {
    val got = Queries.run(relation, Queries.q2Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got,
      "SELECT scenario, flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY scenario, flag",
      "r" -> relation)
  }

  test("Q3 matches DuckDB (oracle-checked)") {
    val got = Queries.run(relation, Queries.q3Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got,
      "SELECT model, flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY model, flag",
      "r" -> relation)
  }

  test("Q4.1 and Q4.2 match DuckDB (oracle-checked)") {
    val got1 = Queries.run(relation, Queries.q41Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got1,
      "SELECT detect AS detect_method, flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY detect, flag",
      "r" -> relation)
    val got2 = Queries.run(relation, Queries.q42Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got2,
      "SELECT repair AS repair_method, flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY repair, flag",
      "r" -> relation)
  }

  test("Q5 matches DuckDB (oracle-checked)") {
    val got = Queries.run(relation, Queries.q5Sql("r", "outliers"), "r")
    Oracle.assertEquivalent(got,
      "SELECT dataset, flag, COUNT(*) AS cnt FROM r WHERE error_type = 'outliers' GROUP BY dataset, flag",
      "r" -> relation)
  }

  test("queries filter by error type") {
    val out = Queries.run(relation, Queries.q1Sql("r", "duplicates"), "r")
    assert(out.count() == 0)
  }

  test("TableFormat collects grouped query output") {
    val got = Queries.run(relation, Queries.q5Sql("r", "outliers"), "r")
    val m = TableFormat.collect(got)
    assert(m.keySet.map(_.head) == Set("EEG", "Sensor", "Credit"))
    assert(m(Seq("EEG")).values.sum == 24) // 3 detect × 2 repair × 2 model × 2 scen
    assert(m(Seq("EEG")) == Map("P" -> 24L))
  }

  test("TableFormat.dist renders percentages and counts") {
    val s = TableFormat.dist(Map("P" -> 3L, "S" -> 1L))
    assert(s.contains("P  75.0% (3)"))
    assert(s.contains("N   0.0% (0)"))
  }
}
