package repro

import org.apache.spark.sql.functions._

/** Sanity for the provided TPC-H-lite generators and the DuckDB oracle
  * plumbing itself (the HOPE suites lean on both).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem is deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity").cast("string").as("s")).collect()
    val b = SynthData.lineitem(spark, 0.001).agg(sum("l_quantity").cast("string").as("s")).collect()
    assert(a.head.getString(0) == b.head.getString(0))
  }

  test("oracle: aggregate over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.001).cache()
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("string").as("n"))
    Oracle.assertEquivalent(got,
      "select l_returnflag, cast(count(*) as varchar) as n from lineitem group by l_returnflag",
      "lineitem" -> li)
  }

  test("oracle: join orders-customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.001).cache()
    val c = SynthData.customer(spark, 0.001).cache()
    val got = o.join(c, o("o_custkey") === c("c_custkey"))
      .agg(count(lit(1)).cast("string").as("n"))
    Oracle.assertEquivalent(got,
      "select cast(count(*) as varchar) as n from orders o join customer c on o.o_custkey = c.c_custkey",
      "orders" -> o, "customer" -> c)
  }

  test("zipf keys are skewed toward small ranks") {
    val df = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
    val top = df.orderBy(col("count").desc).limit(1).collect().head.getLong(1)
    assert(top > 20000 / 100)
  }
}
