package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided scaffolding: the TPC-H-lite generators and
  * the DuckDB oracle wiring itself (a broken oracle would make every other
  * oracle-backed test in the repo meaningless).
  */
class SynthDataOracleSpec extends SparkSpec {

  test("lineitem generator is deterministic and has the documented schema") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1)
    assert(a.columns.toSeq == b.columns.toSeq)
    assert(a.count() == b.count() && a.count() > 0)
    assert(a.columns.contains("l_extendedprice"))
  }

  test("oracle agrees on a grouped aggregate over lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val sparkRes = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum(col("l_quantity")), 2) as "qty")
      .select(col("l_returnflag"), col("cnt"), col("qty"))
    Oracle.assertEquivalent(
      sparkRes,
      """SELECT l_returnflag, COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle agrees on a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.002).cache()
    val c = SynthData.customer(spark, sf = 0.002).cache()
    val sparkRes = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "cnt")
      .select(col("c_mktsegment"), col("cnt"))
    Oracle.assertEquivalent(
      sparkRes,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders o JOIN customer c ON o.o_custkey = c.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed; uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.2)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).first().getLong(1)
    assert(zTop > 4 * uTop, s"zipf top=$zTop uniform top=$uTop")
  }

  test("oracle catches a wrong result (negative control)") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1) as "cnt") // off by one — must be rejected
      .select(col("l_returnflag"), col("cnt"))
    val ex = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
    assert(ex.getMessage.contains("result mismatch"))
  }
}
