package repro

import org.apache.spark.sql.functions._

/** Smoke test for the provided DuckDB oracle + TPC-H-lite generators: proves
  * the oracle catches result differences and passes on equivalent queries.
  */
class OracleSmokeSpec extends SparkSpec {

  test("lineitem aggregate matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val q = li.groupBy("l_returnflag").agg(
      count(lit(1)).cast("double").as("cnt"),
      sum(col("l_quantity")).as("sum_qty"),
    )
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag,
        |       CAST(COUNT(*) AS DOUBLE) AS cnt,
        |       SUM(CAST(l_quantity AS DOUBLE)) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li.select(col("l_returnflag"), col("l_quantity")),
    )
  }

  test("oracle rejects a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val wrong = li.groupBy("l_returnflag").agg((count(lit(1)) + 1).cast("double").as("cnt"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT l_returnflag, CAST(COUNT(*) AS DOUBLE) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li.select(col("l_returnflag")),
      )
    }
  }
}
