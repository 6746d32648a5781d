package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided TPC-H-lite generators plus the DuckDB
  * oracle wiring (aggregations and joins validated engine-to-engine).
  */
class SynthDataSpec extends SparkSpec {

  private val sf = 0.001 // tiny: these are oracle checks, not benches

  test("lineitem generator is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, sf).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("orders aggregate matches DuckDB") {
    // the date column is irrelevant to the aggregate and DateType rows
    // fail to decode on collect in this forked-JVM setup — drop it
    val orders = SynthData.orders(spark, sf).drop("o_orderdate")
    val agg = orders.groupBy(col("o_orderstatus"))
      .agg(count(lit(1)) as "n", round(sum(col("o_totalprice")), 2) as "total")
      .select(col("o_orderstatus"), col("n"), col("total"))
    Oracle.assertEquivalent(
      agg,
      "SELECT o_orderstatus, COUNT(*) AS n, ROUND(SUM(CAST(o_totalprice AS DOUBLE)), 2) AS total " +
        "FROM orders GROUP BY o_orderstatus",
      "orders" -> orders)
  }

  test("customer-orders join matches DuckDB") {
    val orders   = SynthData.orders(spark, sf).drop("o_orderdate")
    val customer = SynthData.customer(spark, sf)
    val joined = orders.join(customer, col("o_custkey") === col("c_custkey"))
      .groupBy(col("c_mktsegment"))
      .agg(count(lit(1)) as "n")
      .select(col("c_mktsegment"), col("n"))
    Oracle.assertEquivalent(
      joined,
      "SELECT c_mktsegment, COUNT(*) AS n FROM orders " +
        "JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT) " +
        "GROUP BY c_mktsegment",
      "orders" -> orders, "customer" -> customer)
  }

  test("uniformKeys covers the requested key range") {
    val df = SynthData.uniformKeys(spark, 5000, 100)
    val (mn, mx) = df.agg(min("k"), max("k")).collect()(0) match {
      case r => (r.getLong(0), r.getLong(1))
    }
    assert(mn >= 1 && mx <= 100)
  }

  test("zipfKeys skews toward low ranks") {
    val df = SynthData.zipfKeys(spark, 20000, 1000)
    val low = df.filter(col("k") <= 10).count().toDouble
    assert(low / 20000 > 0.3, s"low-rank share=${low / 20000}")
  }
}
