package repro

import org.apache.spark.sql.functions._

/** Exercises the provided SynthData generators and the DuckDB oracle on
  * SQL-expressible aggregations — the result-equality harness every
  * query-shaped test in this repo leans on.
  */
class OracleSynthSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()

  test("Oracle: lineitem row count") {
    val got = li.groupBy().agg(count(lit(1)).as("n"))
    Oracle.assertEquivalent(got, "SELECT count(*) AS n FROM lineitem", "lineitem" -> li)
  }

  test("Oracle: grouped aggregation over returnflag/linestatus") {
    val got = li.groupBy("l_returnflag", "l_linestatus")
      .agg(round(sum("l_quantity"), 4).as("sum_qty"),
           count(lit(1)).as("cnt"))
      .select("l_returnflag", "l_linestatus", "sum_qty", "cnt")
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag, l_linestatus,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 4) AS sum_qty,
        |       count(*) AS cnt
        |FROM lineitem GROUP BY 1, 2""".stripMargin,
      "lineitem" -> li)
  }

  test("Oracle: join lineitem with orders") {
    val o = SynthData.orders(spark, sf = 0.002)
    val got = li.join(o, col("l_orderkey") === col("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("n"))
      .select("o_orderstatus", "n")
    Oracle.assertEquivalent(got,
      """SELECT o_orderstatus, count(*) AS n
        |FROM lineitem JOIN orders ON l_orderkey = o_orderkey
        |GROUP BY 1""".stripMargin,
      "lineitem" -> li, "orders" -> o)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).head()
    assert(top.getLong(0) <= 3, s"most frequent key should be a small rank, got ${top.getLong(0)}")
  }

  test("uniform keys cover the key space roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.max.toDouble / counts.min < 1.5)
  }
}
