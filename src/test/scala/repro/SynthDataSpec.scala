package repro

import org.apache.spark.sql.functions._

/** Exercises the provided TPC-H-lite generators + DuckDB oracle, and the
  * paper-specific lake extensions added to SynthData.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates deterministic row counts at SF") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.contains("l_orderkey"))
  }

  test("oracle: TPC-H-lite aggregate agrees with DuckDB") {
    // Project to the grouping column only (full-row collect of the
    // rand()-generated schema trips Spark 4 row decoding).
    val li = SynthData.lineitem(spark, sf = 0.001)
      .select(col("l_returnflag")).limit(500).cache()
    val q = li.groupBy(col("l_returnflag")).agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      q,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("oracle: join cardinality agrees with DuckDB") {
    val o = SynthData.orders(spark, sf = 0.001).select("o_custkey").limit(200).cache()
    val c = SynthData.customer(spark, sf = 0.001).select("c_custkey", "c_mktsegment").cache()
    val q = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy(col("c_mktsegment")).agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(
      q,
      """SELECT c_mktsegment, count(*) AS cnt
        |FROM orders o JOIN customer c ON CAST(o.o_custkey AS BIGINT) = CAST(c.c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }

  test("syntheticLakeLong surfaces the paper's synthetic repository") {
    val df = SynthData.syntheticLakeLong(spark, nBases = 3, derivedPerBase = 3, seed = 1)
    assert(df.columns.toSeq == Seq("table_id", "col_idx", "col_name", "row_idx", "value"))
    assert(df.select("table_id").distinct().count() == 9)
  }

  test("smallerRealLakeLong surfaces the paper's real repository") {
    val df = SynthData.smallerRealLakeLong(spark, nClusters = 2, tablesPerCluster = 3, seed = 1)
    assert(df.select("table_id").distinct().count() == 6)
  }
}
