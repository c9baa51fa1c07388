package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.BenchRunner

/** spark-submit entrypoint for the §7.3 sensitivity analysis (window
  * size and slide interval sweeps on the SO-sim graph).
  */
object SensitivityJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .appName("repro-sensitivity")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val rows = BenchRunner.runSensitivity(spark)
      println(BenchRunner.markdown(rows))
      println(s"written: ${BenchRunner.writeResults("sensitivity", rows)}")
    } finally spark.stop()
  }
}
