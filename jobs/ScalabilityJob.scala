package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint for the compact scalability sweep (paper
  * Experiments 5-6 / Fig. 12 / claim R9) on the synthetic benchmark graphs.
  *
  * Usage: spark-submit --class repro.jobs.ScalabilityJob repro.jar
  */
object ScalabilityJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.get("scalability")
    println(Runners.printScalability(Runners.scalability(spark)))
    spark.stop()
  }
}
