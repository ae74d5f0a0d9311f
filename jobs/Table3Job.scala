package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint reproducing the paper's Table 3 (#wrong
  * aggregates of PGCube* / PGCube^d) plus the MVDCube-vs-PGCube run-time
  * comparison of Fig. 9.
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [scale]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("table3")
    val scale = args.headOption.map(_.toDouble).getOrElse(Runners.scaleFromEnv)
    println(Runners.printTable3(Runners.table3(spark, scale)))
    spark.stop()
  }
}
