package repro

import org.apache.spark.sql.functions._

/** Smoke tests for the provided TPC-H-lite generators and the DuckDB oracle
  * wiring itself (the ER reproduction uses its own generators, but the
  * provided substrate must stay healthy).
  */
class SynthDataSpec extends SparkSpec {

  test("lineitem generates the scaled row count") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    assert(li.count() == 6000L)
  }

  test("orders keys are within range") {
    val o = SynthData.orders(spark, sf = 0.001)
    val row = o.agg(min("o_orderkey"), max("o_orderkey")).head()
    assert(row.getLong(0) == 1L)
    assert(row.getLong(1) == 1500L)
  }

  test("aggregation over lineitem matches DuckDB (oracle)") {
    val li = SynthData.lineitem(spark, sf = 0.0005).cache()
    val agg = li.groupBy("l_returnflag")
      .agg(count(lit(1)).as("cnt"))
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(agg,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }

  test("zipf keys are skewed relative to uniform") {
    val z = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val u = SynthData.uniformKeys(spark, rows = 20000, nKeys = 1000)
    val zTop = z.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    val uTop = u.groupBy("k").count().orderBy(desc("count")).head().getLong(1)
    assert(zTop > uTop * 3, s"zipf top=$zTop uniform top=$uTop")
  }
}
