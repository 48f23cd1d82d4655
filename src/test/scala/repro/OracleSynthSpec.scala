package repro

import org.apache.spark.sql.functions._

/** Exercises the provided DuckDB oracle and TPC-H-lite generators: the
  * oracle must agree with Spark on plain relational aggregates, and the
  * synthetic data must be deterministic in (sf, seed).
  */
class OracleSynthSpec extends SparkSpec {

  test("lineitem row count is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001, seed = 1).count()
    val b = SynthData.lineitem(spark, sf = 0.001, seed = 1).count()
    assert(a == b && a > 0)
  }

  test("oracle agrees on a lineitem group-by aggregate") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(2000).cache()
    val got = li.groupBy(col("l_returnflag").as("rf"))
      .agg(count(lit(1)).as("cnt"), round(sum(col("l_quantity")), 2).as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag AS rf, count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("oracle agrees on an orders filter + count") {
    val o = SynthData.orders(spark, sf = 0.001).limit(1500).cache()
    val got = o.where(col("o_orderstatus") === "O")
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      "SELECT count(*) AS cnt FROM orders WHERE o_orderstatus = 'O'",
      "orders" -> o)
  }

  test("oracle agrees on a customer-orders join aggregate") {
    val c = SynthData.customer(spark, sf = 0.002).cache()
    val o = SynthData.orders(spark, sf = 0.0005).cache()
    val got = o.join(c, col("o_custkey") === col("c_custkey"))
      .groupBy(col("c_mktsegment").as("seg"))
      .agg(count(lit(1)).as("cnt"))
    Oracle.assertEquivalent(
      got,
      """SELECT c_mktsegment AS seg, count(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed, uniform keys are not") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000, alpha = 1.1)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    def topShare(df: org.apache.spark.sql.DataFrame): Double = {
      val top = df.groupBy("k").count().orderBy(desc("count")).limit(10)
        .agg(sum("count")).head().getLong(0)
      top.toDouble / 20000
    }
    assert(topShare(z) > 3 * topShare(u), "zipf should concentrate mass on top keys")
  }

  test("oracle catches a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(500).cache()
    val wrong = li.agg((count(lit(1)) + 1).as("cnt")) // off by one
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong, "SELECT count(*) AS cnt FROM lineitem", "lineitem" -> li)
    }
  }

  test("oracle rejects mismatched column names") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(100).cache()
    val got = li.agg(count(lit(1)).as("n_rows"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got, "SELECT count(*) AS cnt FROM lineitem", "lineitem" -> li)
    }
  }
}
