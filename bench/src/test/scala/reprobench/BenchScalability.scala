package reprobench

import repro.SparkSpec
import repro.bench.Runners

/** Compact scalability sweep (paper Experiments 5-6, Fig. 12, claim R9):
  * evaluation time of MVDCube, MVDCube+ES and PGCube* as |CFS|, M and N
  * vary on the synthetic benchmark graph. Absolute times are not asserted
  * (machine-dependent); the bench prints them for EXPERIMENTS.md.
  */
class BenchScalability extends SparkSpec {

  private lazy val rows = Runners.scalability(spark)

  test("scalability sweep covers |CFS|, M and N variations") {
    println(Runners.printScalability(rows))
    assert(rows.map(_.config) === Seq("|CFS|=50k", "|CFS|=100k", "|CFS|=200k",
                                      "M=5", "M=20", "N=1", "N=2", "N=4"))
  }

  test("all three evaluators complete on every configuration") {
    rows.foreach { r =>
      assert(r.mvdMs > 0 && r.esMs > 0 && r.pgStarMs > 0, r.config)
    }
  }

  test("run time grows with the number of dimensions (N sweep)") {
    val byN = rows.filter(_.config.startsWith("N=")).map(r => r.config -> r.mvdMs).toMap
    assert(byN("N=4") > byN("N=1"), s"expected N=4 slower than N=1: $byN")
  }
}
