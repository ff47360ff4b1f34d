package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators and the DuckDB oracle
  * plumbing itself (the CleanML grid uses its own generators; these keep
  * the shared scaffold honest).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem at SF=0.001 has the expected cardinality and schema") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000L)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_shipdate"))
  }

  test("orders keys are dense from 1..N") {
    val o = SynthData.orders(spark, sf = 0.001)
    val row = o.agg(min("o_orderkey"), max("o_orderkey"), count(lit(1))).head()
    assert(row.getLong(0) == 1L && row.getLong(1) == 1500L && row.getLong(2) == 1500L)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 5000, 100)
    val u = SynthData.uniformKeys(spark, 5000, 100)
    def topShare(df: org.apache.spark.sql.DataFrame): Double =
      df.groupBy("k").count().orderBy(desc("count")).head().getLong(1).toDouble / 5000
    assert(topShare(z) > 2 * topShare(u))
  }

  test("oracle agrees with Spark on a TPC-H-style aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(500).cache()
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(got,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle catches wrong results") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(100).cache()
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("oracle rejects column mismatches") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(50).cache()
    val got = li.groupBy("l_returnflag").agg(count(lit(1)).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }
}
