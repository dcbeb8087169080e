package repro

import org.apache.spark.sql.functions._

/** Smoke coverage of the provided TPC-H-lite generators plus an Oracle
  * round-trip, so the shared scaffolding stays green alongside the tensor
  * stack.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generator: schema and an Oracle-checked aggregation") {
    val li = SynthData.lineitem(spark, sf = 0.001).persist()
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_quantity"))
    val sparkSide = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", sum("l_quantity") as "qty")
    Oracle.assertEquivalent(sparkSide,
      """SELECT l_returnflag, COUNT(*) AS cnt, SUM(CAST(l_quantity AS DOUBLE)) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
    li.unpersist()
  }

  test("orders/customer join cardinality matches DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val sparkSide = o.join(c, o("o_custkey") === c("c_custkey"))
      .agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(sparkSide,
      """SELECT COUNT(*) AS cnt FROM orders o JOIN customer c
        |ON o.o_custkey = c.c_custkey""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipfKeys is skewed; uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, rows = 5000, nKeys = 100)
    val u = SynthData.uniformKeys(spark, rows = 5000, nKeys = 100)
    val topZ = z.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    val topU = u.groupBy("k").count().orderBy(desc("count")).head.getLong(1)
    assert(topZ > 3 * topU, s"zipf top $topZ vs uniform top $topU")
  }
}
