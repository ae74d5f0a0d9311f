package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint reproducing the paper's Table 4 (early-stop
  * effectiveness for k ∈ {3,5,10}, sample size 60, 2 batches).
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [scale]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table4")
    val scale = args.headOption.map(_.toDouble).getOrElse(Runners.scaleFromEnv)
    println(Runners.printTable4(Runners.table4(spark, scale)))
    spark.stop()
  }
}
