package jobs

import org.apache.spark.sql.SparkSession
import repro.eval.BenchRunner
import repro.kb.World

/** Shared SparkSession + runner bootstrap for the spark-submit entrypoints.
  * Each job prints one reproduced table to stdout.
  */
object JobSession {
  def runner(appName: String): BenchRunner = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(appName)
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", false)
      .getOrCreate()
    spark.sparkContext.setLogLevel("WARN")
    new BenchRunner(spark, new World(42L))
  }
}
