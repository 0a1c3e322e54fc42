package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided SynthData generators + DuckDB oracle wiring.
  * (The AGL reproduction evaluates on graphs — see repro.graph.GraphGen — but
  * the relational generators stay exercised, and zipfKeys documents the skew
  * model reused for UUG-lite hub destinations.)
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem aggregation matches DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001).select("l_returnflag", "l_quantity")
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(
      agg,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("orders/customer keys join consistently") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val nCust = c.count()
    val bad = o.join(c, o("o_custkey") === c("c_custkey"), "left_anti").count()
    assert(nCust > 0 && bad == 0, s"$bad orders reference missing customers")
  }

  test("zipfKeys is visibly more skewed than uniformKeys") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zMax = z.groupBy("k").count().agg(max("count")).first().getLong(0)
    val uMax = u.groupBy("k").count().agg(max("count")).first().getLong(0)
    assert(zMax > 5 * uMax, s"zipf max $zMax vs uniform max $uMax")
  }
}
