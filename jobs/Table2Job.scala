package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchRunner

/** spark-submit entrypoint reproducing paper Table 2.
  *
  * Usage: `spark-submit --class repro.jobs.Table2Job <jar> [Q1 Q2 ...]`
  * (optional query-name args restrict the sweep). Scale with BENCH_SCALE,
  * output directory with BENCH_OUT.
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .appName("repro-table2")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val queries = if (args.nonEmpty) args.toSeq else repro.streams.Workloads.queryNames
      val rows = BenchRunner.runTable2(spark, queries)
      println(BenchRunner.markdown(rows))
      println(s"written: ${BenchRunner.writeResults("table2", rows)}")
    } finally spark.stop()
  }
}
