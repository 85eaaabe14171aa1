package repro

import org.apache.spark.sql.functions._

/** Keeps the provided TPC-H-lite generators and the DuckDB oracle honest —
  * the oracle plumbing (VARCHAR staging, canonicalization, aliasing rules)
  * is what every result-level test in the repo leans on.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator produces the expected columns and row count scaling") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_extendedprice"))
    assert(li.count() == 6000)
  }

  test("oracle validates a grouped aggregate over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val got = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(
      got,
      "SELECT l_returnflag, CAST(count(*) AS BIGINT) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li,
    )
  }

  test("oracle validates an order-by-limit query (ranked retrieval baseline)") {
    val orders = SynthData.orders(spark, sf = 0.001).cache()
    val got = orders
      .orderBy(col("o_totalprice").asc, col("o_orderkey").asc)
      .limit(10)
      .select(col("o_orderkey"), col("o_totalprice"))
    Oracle.assertEquivalent(
      got,
      """SELECT CAST(o_orderkey AS BIGINT) AS o_orderkey,
        |       CAST(o_totalprice AS DOUBLE) AS o_totalprice
        |FROM orders
        |ORDER BY CAST(o_totalprice AS DOUBLE), CAST(o_orderkey AS BIGINT)
        |LIMIT 10""".stripMargin,
      "orders" -> orders,
    )
  }

  test("oracle catches a wrong result") {
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val wrong = c.limit(5).select(col("c_custkey"))
    val ex = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(
        wrong,
        "SELECT CAST(c_custkey AS BIGINT) AS c_custkey FROM customer",
        "customer" -> c,
      )
    }
    assert(ex.getMessage.contains("result mismatch"))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(zTop > 3 * uTop, s"zipf top $zTop vs uniform top $uTop")
  }
}
