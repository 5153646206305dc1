package repro

import org.apache.spark.sql.functions._
import org.scalatest.funsuite.AnyFunSuite

/** Smoke tests for the provided TPC-H-lite generators (kept healthy even
  * though the culinary pipeline uses its own corpus generator).
  */
class SynthDataSpec extends AnyFunSuite with SparkSpec {

  test("lineitem has the expected schema and row count at SF 0.001") {
    val df = SynthData.lineitem(spark, sf = 0.001)
    assert(df.columns.toSeq == Seq("l_orderkey", "l_partkey", "l_linenumber",
      "l_quantity", "l_extendedprice", "l_discount", "l_tax", "l_returnflag",
      "l_linestatus", "l_shipdate"))
    assert(df.count() == 6000)
  }

  test("orders keys are dense from 1") {
    val df = SynthData.orders(spark, sf = 0.001)
    assert(df.agg(min("o_orderkey"), max("o_orderkey")).collect()(0).toSeq == Seq(1L, 1500L))
  }

  test("customer and part row counts scale with SF") {
    assert(SynthData.customer(spark, sf = 0.001).count() == 150)
    assert(SynthData.part(spark, sf = 0.001).count() == 200)
  }

  test("generators are deterministic in (sf, seed)") {
    // (dates collected as strings — DateType row decoding is unsupported
    // under this JDK/Spark combination)
    def snapshot() = SynthData.lineitem(spark, 0.0005, seed = 5)
      .withColumn("l_shipdate", col("l_shipdate").cast("string")).collect()
    assert(snapshot().sameElements(snapshot()))
  }

  test("zipfKeys produces skewed keys, uniformKeys does not") {
    val z = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    val u = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy(desc("count")).limit(1).collect()(0).getLong(1)
    assert(z > 3 * u, s"zipf top=$z uniform top=$u")
  }

  test("an aggregate over lineitem agrees with the DuckDB oracle") {
    val li = SynthData.lineitem(spark, 0.0005)
      .withColumn("l_shipdate", col("l_shipdate").cast("string"))
    val got = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"), round(sum("l_quantity"), 4).as("qty"))
    Oracle.assertEquivalent(
      got,
      """SELECT l_returnflag, CAST(COUNT(*) AS BIGINT) AS cnt,
        |       ROUND(SUM(CAST(l_quantity AS DOUBLE)), 4) AS qty
        |FROM lineitem GROUP BY 1""".stripMargin,
      "lineitem" -> li,
    )
  }
}
