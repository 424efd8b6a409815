package repro

import org.apache.spark.sql.functions._

/** Sanity checks that the DuckDB oracle harness itself works, over the
  * provided TPC-H-lite generators.
  */
class OracleSanitySpec extends SparkSpec {

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).persist()
  private lazy val o  = SynthData.orders(spark, sf = 0.001).persist()

  test("lineitem aggregate matches DuckDB") {
    val df = li.groupBy("l_returnflag")
      .agg(count("*").as("n"), round(sum("l_quantity"), 2).as("qty"))
      .select(col("l_returnflag"), col("n"), col("qty"))
    Oracle.assertEquivalent(df,
      """SELECT l_returnflag, count(*) AS n, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
         FROM lineitem GROUP BY l_returnflag""",
      "lineitem" -> li)
  }

  test("join + filter matches DuckDB") {
    val df = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .filter(col("o_orderstatus") === "O")
      .groupBy("o_orderstatus").agg(count("*").as("n"))
      .select(col("o_orderstatus"), col("n"))
    Oracle.assertEquivalent(df,
      """SELECT o_orderstatus, count(*) AS n
         FROM lineitem JOIN orders ON l_orderkey = o_orderkey
         WHERE o_orderstatus = 'O' GROUP BY o_orderstatus""",
      "lineitem" -> li, "orders" -> o)
  }

  test("the oracle catches wrong results") {
    val wrong = li.groupBy("l_returnflag").agg((count("*") + 1).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("the oracle catches column mismatches") {
    val df = li.groupBy("l_returnflag").agg(count("*").as("wrong_name"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df,
        "SELECT l_returnflag, count(*) AS n FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.0005).agg(sum("l_orderkey")).collect()(0).getLong(0)
    val b = SynthData.lineitem(spark, sf = 0.0005).agg(sum("l_orderkey")).collect()(0).getLong(0)
    assert(a === b)
  }
}
