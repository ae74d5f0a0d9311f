package reprobench

import repro.SparkSpec
import repro.bench.Runners

/** Reproduces paper Table 3 (#wrong PGCube aggregates) together with the
  * MVDCube-vs-PGCube run-time comparison of Fig. 9. Checks the paper's
  * qualitative claims R4, R5 (and prints timings for R2/R3).
  */
class BenchTable3 extends SparkSpec {

  private lazy val rows = Runners.table3(spark, Runners.scaleFromEnv)

  test("Table 3 rows are produced for all six datasets") {
    println(Runners.printTable3(rows))
    assert(rows.size === 6)
  }

  test("Airline (single-valued, relational shape) has zero wrong aggregates") {
    val a = rows.find(_.dataset == "Airline").get
    assert(a.wrongStar === 0 && a.wrongDist === 0)
  }

  test("R4: multi-valued graphs make PGCube produce wrong aggregates") {
    for (name <- Seq("CEOs", "NASA", "Nobel")) {
      val r = rows.find(_.dataset == name).get
      assert(r.wrongStar > 0, s"$name: expected PGCube* errors")
      assert(r.wrongDist > 0, s"$name: expected PGCube^d errors")
    }
  }

  test("count(distinct) repairs some errors: #wrong^d <= #wrong*") {
    rows.foreach(r => assert(r.wrongDist <= r.wrongStar, r.dataset))
  }

  test("R5: error ratios can be large (>= 2x somewhere)") {
    assert(rows.map(_.maxErrRatioDist).max >= 2.0)
  }

  test("error ratios never fall below 1 (PGCube only ever overstates)") {
    rows.foreach(r => assert(r.maxErrRatioDist >= 1.0 - 1e-9, r.dataset))
  }
}
