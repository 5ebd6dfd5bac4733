package repro

import org.apache.spark.sql.functions._

/** The provided TPC-H-lite generators remain part of the repo's substrate;
  * these tests pin their schemas and determinism, and exercise the DuckDB
  * oracle end-to-end on an aggregation query over them.
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem schema and row count scale with sf") {
    val df = SynthData.lineitem(spark, sf = 0.001)
    assert(df.columns.toSeq == Seq("l_orderkey", "l_partkey", "l_linenumber",
      "l_quantity", "l_extendedprice", "l_discount", "l_tax", "l_returnflag",
      "l_linestatus", "l_shipdate"))
    assert(df.count() == 6000)
  }

  test("orders/customer/part row counts scale with sf") {
    assert(SynthData.orders(spark, 0.001).count() == 1500)
    assert(SynthData.customer(spark, 0.001).count() == 150)
    assert(SynthData.part(spark, 0.001).count() == 200)
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, 0.0005, seed = 3).collect().map(_.toString).sorted
    val b = SynthData.lineitem(spark, 0.0005, seed = 3).collect().map(_.toString).sorted
    assert(a.toSeq == b.toSeq)
  }

  test("zipfKeys is skewed toward low ranks; uniformKeys is not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
    val zTop = z.orderBy(desc("count")).head().getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
    val uTop = u.orderBy(desc("count")).head().getLong(1)
    assert(zTop > 3 * uTop, s"zipf top=$zTop should dwarf uniform top=$uTop")
  }

  test("ORACLE: revenue aggregation over lineitem matches DuckDB") {
    val li = SynthData.lineitem(spark, 0.0005)
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt",
           round(sum(col("l_extendedprice")), 2) as "revenue")
      .orderBy("l_returnflag")
    Oracle.assertEquivalent(agg,
      """SELECT l_returnflag,
        |       COUNT(*) AS cnt,
        |       ROUND(SUM(CAST(l_extendedprice AS DOUBLE)), 2) AS revenue
        |FROM lineitem GROUP BY l_returnflag ORDER BY l_returnflag""".stripMargin,
      "lineitem" -> li)
  }

  test("ORACLE: join cardinality orders x customer matches DuckDB") {
    val o = SynthData.orders(spark, 0.001)
    val c = SynthData.customer(spark, 0.001)
    val joined = o.join(c, o("o_custkey") === c("c_custkey"))
      .groupBy("c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(joined,
      """SELECT c_mktsegment, COUNT(*) AS cnt
        |FROM orders JOIN customer ON CAST(o_custkey AS BIGINT) = CAST(c_custkey AS BIGINT)
        |GROUP BY c_mktsegment""".stripMargin,
      "orders" -> o, "customer" -> c)
  }
}
