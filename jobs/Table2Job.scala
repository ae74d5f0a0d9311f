package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Runners

/** spark-submit entrypoint reproducing the paper's Table 2 (dataset and
  * aggregate-space statistics, with vs without derived properties).
  *
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [scale]
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table2")
    val scale = args.headOption.map(_.toDouble).getOrElse(Runners.scaleFromEnv)
    println(Runners.printTable2(Runners.table2(spark, scale)))
    spark.stop()
  }
}

/** Shared session builder for the job entrypoints. */
object JobSession {
  def get(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(s"repro-$name")
      .config("spark.sql.shuffle.partitions",
              sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .config("spark.ui.enabled", "false")
      .getOrCreate()
}
