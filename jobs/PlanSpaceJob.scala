package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchRunner

/** spark-submit entrypoint for the §7.4 plan-space micro-benchmark
  * (Q4 plans SGA/P1/P2/P3 and the Q2/Q3 alternative plans).
  */
object PlanSpaceJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .appName("repro-planspace")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val rows = BenchRunner.runPlanSpace(spark)
      println(BenchRunner.markdown(rows))
      println(s"written: ${BenchRunner.writeResults("planspace", rows)}")
    } finally spark.stop()
  }
}
