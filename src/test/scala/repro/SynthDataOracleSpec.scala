package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators against the DuckDB oracle —
  * the base wiring every other Oracle-checked test relies on.
  */
class SynthDataOracleSpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.002).cache()
  private lazy val ord = SynthData.orders(spark, sf = 0.002).cache()

  test("lineitem row count scales with SF") {
    assert(li.count() == (6000000 * 0.002).toLong)
  }

  test("aggregate by returnflag matches DuckDB") {
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 2).as("qty"))
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM li GROUP BY l_returnflag""".stripMargin,
      "li" -> li)
  }

  test("join lineitem-orders aggregate matches DuckDB") {
    val got = li.join(ord, li("l_orderkey") === ord("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(got,
      """SELECT o_orderstatus, count(*) AS cnt
        |FROM li JOIN ord ON li.l_orderkey = ord.o_orderkey
        |GROUP BY o_orderstatus""".stripMargin,
      "li" -> li, "ord" -> ord)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 100)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val total = df.count().toDouble
      df.groupBy("k").count().orderBy(desc("count")).limit(1)
        .head.getLong(1) / total
    }
    assert(topShare(z) > 0.2, "zipf top key should dominate")
    assert(topShare(u) < 0.05, "uniform top key should not dominate")
  }
}
