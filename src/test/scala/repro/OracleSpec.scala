package repro

import org.apache.spark.sql.functions._

/** Oracle plumbing checks over the provided TPC-H-lite generators: the
  * DuckDB cross-check must agree with Spark on straightforward SQL and
  * must catch a deliberately wrong result.
  */
class OracleSpec extends SparkSpec {
  lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()

  test("aggregate equivalence on lineitem") {
    val df = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum("l_quantity"), 2) as "qty")
      .select("l_returnflag", "cnt", "qty")
    Oracle.assertEquivalent(df,
      "SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("join equivalence between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001)
    val c = SynthData.customer(spark, sf = 0.001)
    val df = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "n")
    Oracle.assertEquivalent(df,
      "SELECT c_mktsegment, count(*) AS n FROM orders o JOIN customer c " +
        "ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT) GROUP BY c_mktsegment",
      "orders" -> o, "customer" -> c)
  }

  test("a wrong Spark result is rejected") {
    val df = li.groupBy("l_returnflag").agg((count(lit(1)) + 1) as "cnt")
    intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
  }

  test("a column-name mismatch is rejected with guidance") {
    val df = li.groupBy("l_returnflag").agg(count(lit(1)) as "wrong_name")
    val e = intercept[IllegalArgumentException] {
      Oracle.assertEquivalent(df,
        "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
        "lineitem" -> li)
    }
    assert(e.getMessage.contains("alias"))
  }
}
