package repro

/** Smoke checks of the provided TPC-H-lite generators through the DuckDB
  * oracle — guards the shared infrastructure the reproduction builds on.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem aggregate by returnflag is DuckDB-equivalent") {
    val li = SynthData.lineitem(spark, sf = 0.001).limit(2000).cache()
    val sql = """SELECT l_returnflag AS flag, count(*) AS cnt,
                 |       sum(cast(l_quantity as double)) AS qty
                 |FROM lineitem GROUP BY l_returnflag""".stripMargin
    li.createOrReplaceTempView("lineitem")
    Oracle.assertEquivalent(spark.sql(sql), sql, "lineitem" -> li)
    li.unpersist()
  }

  test("orders row count matches the scale factor") {
    val n = SynthData.orders(spark, sf = 0.001).count()
    assert(n == 1500L)
  }

  test("orders-customer join count is DuckDB-equivalent") {
    val o = SynthData.orders(spark, sf = 0.001).limit(500).cache()
    val c = SynthData.customer(spark, sf = 0.001).cache()
    val sql = """SELECT count(*) AS cnt
                 |FROM orders o JOIN customer c
                 |  ON cast(o.o_custkey as bigint) = cast(c.c_custkey as bigint)""".stripMargin
    o.createOrReplaceTempView("orders")
    c.createOrReplaceTempView("customer")
    Oracle.assertEquivalent(spark.sql(sql), sql, "orders" -> o, "customer" -> c)
    o.unpersist(); c.unpersist()
  }

  test("zipfKeys is skewed: top key far exceeds the median key frequency") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1)).sorted.reverse
    assert(counts.head > counts(counts.length / 2) * 5)
  }

  test("uniformKeys covers the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 100)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length > 90)
    assert(counts.max < counts.min * 3)
  }
}
