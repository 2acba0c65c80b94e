package repro

import org.apache.spark.sql.functions._

/** Sanity tests of the DuckDB oracle itself over the provided TPC-H-lite
  * generators, plus negative tests showing it catches wrong results.
  */
class OracleSpec extends SparkSpec {

  test("aggregate query matches DuckDB on lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"),
           round(sum(col("l_quantity")), 2).as("qty"))
      .select("l_returnflag", "cnt", "qty")
    Oracle.assertEquivalent(got,
      """SELECT l_returnflag,
        |       count(*) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("join query matches DuckDB on orders x customer") {
    val o = SynthData.orders(spark, sf = 0.002).cache()
    val c = SynthData.customer(spark, sf = 0.002).cache()
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment")
      .agg(count(lit(1)).as("cnt"))
      .select("c_mktsegment", "cnt")
    Oracle.assertEquivalent(got,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders JOIN customer ON o_custkey = c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("filter + projection matches DuckDB on part") {
    val p = SynthData.part(spark, sf = 0.005).cache()
    val got = p.filter(col("p_size") > 25)
      .select(col("p_partkey"), col("p_type"))
    Oracle.assertEquivalent(got,
      "SELECT p_partkey, p_type FROM part WHERE CAST(p_size AS INT) > 25",
      "part" -> p)
  }

  test("the oracle rejects a wrong result") {
    val li = SynthData.lineitem(spark, sf = 0.001).cache()
    val wrong = li.groupBy("l_returnflag")
      .agg((count(lit(1)) + 1).as("cnt")) // off by one
      .select("l_returnflag", "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(wrong,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("the oracle rejects mismatched column aliases") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(10).cache()
    val got = li.agg(count(lit(1)).as("n"))
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(got,
        "SELECT count(*) AS other_name FROM lineitem", "lineitem" -> li)
    }
  }
}
