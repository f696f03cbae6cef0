package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators against the DuckDB oracle —
  * both to validate SynthData determinism and to keep the Oracle harness
  * itself honest on classic relational aggregations.
  */
class OracleSynthSpec extends SparkSpec {

  private lazy val li   = SynthData.lineitem(spark, sf = 0.001).cache()
  private lazy val ord  = SynthData.orders(spark, sf = 0.001).cache()
  private lazy val cust = SynthData.customer(spark, sf = 0.001).cache()

  test("lineitem aggregate by returnflag matches DuckDB") {
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("n"),
           round(sum(col("l_quantity")), 2).as("sum_qty"))
    Oracle.assertEquivalent(q,
      """SELECT l_returnflag, COUNT(*) AS n,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS sum_qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders filter + count matches DuckDB") {
    val q = ord.filter(col("o_orderstatus") === "O")
      .agg(count(lit(1)).as("n_open"))
    Oracle.assertEquivalent(q,
      "SELECT COUNT(*) AS n_open FROM orders WHERE o_orderstatus = 'O'",
      "orders" -> ord)
  }

  test("orders-customer join aggregation matches DuckDB") {
    val q = ord.join(cust, ord("o_custkey") === cust("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("n_orders"))
    Oracle.assertEquivalent(q,
      """SELECT c_mktsegment, COUNT(*) AS n_orders
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> ord, "customer" -> cust)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100)
      .groupBy("k").count().orderBy(desc("count")).head()
    val u = SynthData.uniformKeys(spark, rows = 5000, nKeys = 100)
      .groupBy("k").count().orderBy(desc("count")).head()
    assert(z.getLong(1) > u.getLong(1) * 2)
  }
}
