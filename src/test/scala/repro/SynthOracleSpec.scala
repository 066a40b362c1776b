package repro

/** Smoke tests wiring the provided SynthData generators through the DuckDB
  * oracle — keeps the shared TPC-H-lite substrate exercised even though
  * this paper's evaluation is graph-shaped.
  */
class SynthOracleSpec extends SparkSpec {
  import org.apache.spark.sql.functions._

  test("oracle validates an aggregation over SynthData lineitem") {
    val li = SynthData.lineitem(spark, sf = 0.001).localCheckpoint()
    val df = li.groupBy("l_returnflag")
      .agg(count(lit(1)).cast("long").as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(df,
      "SELECT l_returnflag, COUNT(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle validates a join between orders and customer") {
    val o = SynthData.orders(spark, sf = 0.001).localCheckpoint()
    val c = SynthData.customer(spark, sf = 0.001).localCheckpoint()
    val df = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)).cast("long").as("cnt"))
    Oracle.assertEquivalent(df,
      """SELECT c_mktsegment, COUNT(*) AS cnt FROM orders o
        |JOIN customer c ON o.o_custkey = c.c_custkey
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
