package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators and the DuckDB oracle harness: used
  * here to validate the oracle wiring itself (the graph experiments use the
  * same oracle for their relational aggregations).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val q = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 4).as("qty"))
    Oracle.assertEquivalent(
      q,
      """SELECT l_returnflag, count(*)::BIGINT AS cnt,
                round(sum(l_quantity::DOUBLE), 4) AS qty
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }

  test("orders join customer matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      q,
      """SELECT c_mktsegment, count(*)::BIGINT AS cnt
         FROM orders o JOIN customer c ON o.o_custkey = c.c_custkey
         GROUP BY c_mktsegment""",
      "orders" -> o, "customer" -> c)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    val b = SynthData.part(spark, sf = 0.001).collect().map(_.toString).sorted
    assert(a.sameElements(b))
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > 3 * u)
  }
}
