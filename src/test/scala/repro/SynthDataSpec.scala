package repro

import org.apache.spark.sql.functions._

/** Sanity of the provided TPC-H-lite scaffolding plus one end-to-end
  * Oracle round-trip on a relational aggregate, proving the DuckDB
  * bridge itself before the SGA suites rely on it.
  */
class SynthDataSpec extends SparkSpec {

  test("generators are deterministic in (sf, seed)") {
    val a = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    val b = SynthData.lineitem(spark, sf = 0.001).agg(sum("l_quantity")).collect()(0).getDouble(0)
    assert(a == b)
  }

  test("row counts scale with sf") {
    assert(SynthData.orders(spark, sf = 0.001).count() == 1500L)
    assert(SynthData.customer(spark, sf = 0.001).count() == 150L)
  }

  test("zipf keys are skewed toward small ranks") {
    val df = SynthData.zipfKeys(spark, rows = 20000, nKeys = 1000)
    val top = df.filter(col("k") <= 10).count()
    assert(top > 5000, s"rank<=10 should dominate, got $top/20000")
  }

  test("uniform keys cover the key space roughly evenly") {
    val df = SynthData.uniformKeys(spark, rows = 20000, nKeys = 10)
    val counts = df.groupBy("k").count().collect().map(_.getLong(1))
    assert(counts.forall(c => c > 1000 && c < 3000))
  }

  test("Oracle validates a Spark aggregate against DuckDB") {
    val li = SynthData.lineitem(spark, sf = 0.001)
    val sparkDf = li
      .groupBy("l_returnflag")
      .agg(count(lit(1)) as "cnt")
      .select(col("l_returnflag"), col("cnt"))
    Oracle.assertEquivalent(
      sparkDf,
      "SELECT l_returnflag, count(*) AS cnt FROM lineitem GROUP BY l_returnflag",
      "lineitem" -> li)
  }
}
