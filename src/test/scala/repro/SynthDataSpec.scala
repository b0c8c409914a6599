package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators plus the DuckDB oracle
  * machinery end-to-end (the oracle is also used by the index tests; this
  * proves it catches real aggregation semantics).
  */
class SynthDataSpec extends SparkSpec {
  import spark.implicits._

  test("lineitem generator is deterministic and sized by sf") {
    val a = SynthData.lineitem(spark, sf = 0.001)
    val b = SynthData.lineitem(spark, sf = 0.001)
    assert(a.count() == b.count())
    assert(a.count() == 6000L)
  }

  test("orders keys are dense 1..n") {
    val o = SynthData.orders(spark, sf = 0.001)
    assert(o.agg(min("o_orderkey"), max("o_orderkey")).collect()(0).toSeq == Seq(1L, 1500L))
  }

  test("aggregation over lineitem matches DuckDB (oracle smoke)") {
    // DateType rows fail Spark 4's row decoder on collect; the oracle keeps
    // everything as VARCHAR anyway, so ship dates as strings.
    val li = SynthData.lineitem(spark, sf = 0.001)
      .withColumn("l_shipdate", col("l_shipdate").cast("string"))
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum($"l_quantity"), 2) as "qty")
      .select($"l_returnflag", $"cnt".cast("string") as "cnt", $"qty".cast("double") as "qty")
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag,
        |       CAST(count(*) AS VARCHAR) AS cnt,
        |       round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty
        |FROM lineitem GROUP BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("join lineitem-orders matches DuckDB (oracle smoke)") {
    val li = SynthData.lineitem(spark, sf = 0.0005)
      .withColumn("l_shipdate", col("l_shipdate").cast("string"))
    val o  = SynthData.orders(spark, sf = 0.0005)
      .withColumn("o_orderdate", col("o_orderdate").cast("string"))
    val got = li.join(o, li("l_orderkey") === o("o_orderkey"))
      .groupBy("o_orderstatus").agg(count(lit(1)) as "cnt")
      .select($"o_orderstatus", $"cnt".cast("string") as "cnt")
    Oracle.assertEquivalent(
      got,
      """SELECT o_orderstatus, CAST(count(*) AS VARCHAR) AS cnt
        |FROM lineitem JOIN orders ON CAST(l_orderkey AS BIGINT) = CAST(o_orderkey AS BIGINT)
        |GROUP BY o_orderstatus""".stripMargin,
      "lineitem" -> li, "orders" -> o)
  }

  test("zipf keys are skewed toward small ranks") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = z.groupBy("k").count().orderBy(desc("count")).limit(1).collect()(0)
    assert(top.getLong(0) <= 3, "most frequent key should be a low rank")
  }

  test("uniform keys cover the key range roughly evenly") {
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = u.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.length == 10)
    assert(counts.min > 20000 / 10 * 0.7)
  }
}
