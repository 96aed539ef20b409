package repro

import org.apache.spark.sql.functions._

/** Sanity coverage for the provided TPC-H-lite generators.
  *
  * CERES is not an OLAP paper, so these generators are not the evaluation
  * dataset (the synthetic web substrate in `repro.web` is); they remain the
  * canonical check that the Spark environment computes aggregations the
  * DuckDB oracle agrees with, at the same SF used by the unit tests.
  */
class SynthDataSpec extends SparkSpec {
  import spark.implicits._

  private lazy val li = SynthData.lineitem(spark, sf = 0.001).cache()

  test("lineitem row count scales with sf") {
    assert(li.count() == 6000L)
  }
  test("lineitem schema fields") {
    assert(li.columns.toSet.contains("l_orderkey"))
    assert(li.columns.length == 10)
  }
  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).first().getDouble(0)
    val b = SynthData.orders(spark, 0.001).agg(sum("o_totalprice")).first().getDouble(0)
    assert(a == b)
  }
  test("zipf keys are skewed; uniform keys are not") {
    val zipfTop = SynthData.zipfKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy($"count".desc).first().getLong(1)
    val uniTop = SynthData.uniformKeys(spark, 20000, 1000).groupBy("k").count()
      .orderBy($"count".desc).first().getLong(1)
    assert(zipfTop > uniTop * 3, s"zipf=$zipfTop uniform=$uniTop")
  }
  test("oracle: lineitem aggregation matches DuckDB") {
    val small = li.limit(500).select($"l_returnflag", $"l_quantity").cache()
    val agg = small.groupBy($"l_returnflag")
      .agg(count(lit(1)) as "cnt", round(sum($"l_quantity"), 2) as "qty")
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, count(*) AS cnt, round(sum(CAST(l_quantity AS DOUBLE)), 2) AS qty " +
        "FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> small)
  }
  test("oracle: customer segment counts match DuckDB") {
    val c = SynthData.customer(spark, 0.001).cache()
    val agg = c.groupBy($"c_mktsegment").agg(count(lit(1)) as "cnt")
    Oracle.assertEquivalent(agg,
      "SELECT c_mktsegment, count(*) AS cnt FROM customer GROUP BY c_mktsegment",
      "customer" -> c)
  }
}
