package repro

import org.apache.spark.sql.functions._

class SynthDataSpec extends SparkSpec {

  test("lineitem generates the expected row count and schema at SF=0.001") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000)
    assert(li.columns.contains("l_orderkey") && li.columns.contains("l_extendedprice"))
  }

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001, seed = 1).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    val b = SynthData.orders(spark, 0.001, seed = 1).agg(sum("o_totalprice")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("zipfKeys is skewed; uniformKeys is flat") {
    val z = SynthData.zipfKeys(spark, 5000, 100).groupBy("k").count()
    val zMax = z.agg(max("count")).collect()(0).getLong(0)
    val u = SynthData.uniformKeys(spark, 5000, 100).groupBy("k").count()
    val uMax = u.agg(max("count")).collect()(0).getLong(0)
    assert(zMax > 3 * uMax, s"zipf max $zMax should dwarf uniform max $uMax")
  }

  test("oracle smoke test: a Spark aggregate matches DuckDB") {
    val cust = SynthData.customer(spark, 0.01)
    val sparkDf = cust.groupBy("c_mktsegment").agg(count(lit(1)).as("n"))
      .select(col("c_mktsegment"), col("n"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT c_mktsegment, COUNT(*) AS n FROM customer GROUP BY c_mktsegment",
      "customer" -> cust)
  }
}
