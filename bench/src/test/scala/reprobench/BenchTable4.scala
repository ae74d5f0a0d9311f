package reprobench

import repro.SparkSpec
import repro.bench.Runners

/** Reproduces paper Table 4: early-stop effectiveness (time gain, pruning
  * rate, top-k accuracy) for k ∈ {3, 5, 10}. Checks the paper's qualitative
  * claims R6, R7 — timing gains themselves are machine-dependent and may be
  * negative on small graphs (the paper observes this too on Foodista/DBLP).
  */
class BenchTable4 extends SparkSpec {

  private lazy val rows = Runners.table4(spark, Runners.scaleFromEnv)

  test("Table 4 cells are produced for all six datasets × k ∈ {3,5,10}") {
    println(Runners.printTable4(rows))
    assert(rows.size === 6)
    assert(rows.forall(_.cells.map(_.k) === Seq(3, 5, 10)))
  }

  test("R6: early-stop prunes aggregates on the MDA-rich graphs") {
    for (name <- Seq("Airline", "CEOs", "NASA", "Nobel")) {
      val r = rows.find(_.dataset == name).get
      assert(r.cells.exists(_.prunedPct > 10.0),
        s"$name: expected >10% pruning, got ${r.cells.map(_.prunedPct)}")
    }
  }

  test("pruning is monotone-ish in k: smaller k prunes at least as much") {
    rows.foreach { r =>
      val byK = r.cells.map(c => c.k -> c.prunedPct).toMap
      assert(byK(3) + 5.0 >= byK(10),
        s"${r.dataset}: pruning at k=3 (${byK(3)}) far below k=10 (${byK(10)})")
    }
  }

  test("R7: top-k accuracy stays high on average") {
    val accs = rows.flatMap(_.cells).map(_.accPct)
    assert(accs.sum / accs.size >= 60.0,
      s"average accuracy too low: ${accs.sum / accs.size}")
  }

  test("pruned + evaluated accounting is consistent (pct within [0,100])") {
    rows.flatMap(_.cells).foreach { c =>
      assert(c.prunedPct >= 0.0 && c.prunedPct <= 100.0)
      assert(c.accPct >= 0.0 && c.accPct <= 100.0)
    }
  }
}
