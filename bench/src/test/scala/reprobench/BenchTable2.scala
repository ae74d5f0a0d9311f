package reprobench

import repro.SparkSpec
import repro.bench.Runners

/** Reproduces paper Table 2: per-dataset statistics of the identification
  * pipeline, with vs without derived properties. Prints the table and checks
  * the paper's qualitative shape (remark R1).
  */
class BenchTable2 extends SparkSpec {

  private lazy val rows = Runners.table2(spark, Runners.scaleFromEnv)

  test("Table 2 rows are produced for all six datasets") {
    println(Runners.printTable2(rows))
    assert(rows.map(_.dataset) ===
      Seq("Airline", "CEOs", "DBLP", "Foodista", "NASA", "Nobel"))
  }

  test("R1/Airline: the relational graph yields no derivations at all") {
    val a = rows.find(_.dataset == "Airline").get
    assert(a.kw + a.lang + a.cnt + a.path === 0)
    assert(a.aWoD === a.aWD)
    assert(a.nCfs === 1)
  }

  test("R1: derivations enlarge the aggregate space of every native graph") {
    for (r <- rows if r.dataset != "Airline") {
      assert(r.aWD > r.aWoD, s"${r.dataset}: wD=${r.aWD} !> woD=${r.aWoD}")
      assert(r.kw + r.lang + r.cnt + r.path > 0, r.dataset)
    }
  }

  test("Foodista shape: (almost) no aggregates without derivations") {
    val f = rows.find(_.dataset == "Foodista").get
    assert(f.aWoD <= 2, s"Foodista woD=${f.aWoD} (paper: 0)")
  }

  test("path derivations are the most numerous kind on link-rich graphs") {
    for (name <- Seq("CEOs", "NASA", "Nobel")) {
      val r = rows.find(_.dataset == name).get
      assert(r.path >= r.kw && r.path >= r.lang, name)
    }
  }
}
