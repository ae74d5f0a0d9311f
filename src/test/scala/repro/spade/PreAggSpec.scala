package repro.spade

import repro.SparkSpec

class PreAggSpec extends SparkSpec {
  import spark.implicits._

  private lazy val bag = Seq(
    ("m", "a", "10"), ("m", "a", "30"),
    ("m", "b", "5"),
    ("k", "a", "1"),
    ("n", "b", "2.5"), ("n", "c", "4.5"),
  ).toDF("attr", "fact", "value")
  private lazy val facts = Seq("a", "b", "c", "d").toDF("fact")
  private lazy val pa = PreAgg.build(bag, facts, Seq("m", "n"))

  private def row(fact: String) =
    pa.df.filter(s"fact = '$fact'").collect().headOption.getOrElse(fail(s"no row for $fact"))

  test("per-fact count/sum/min/max of a multi-valued measure") {
    val r = row("a")
    assert(r.getAs[Long](pa.cntCol("m")) === 2)
    assert(r.getAs[Double](pa.sumCol("m")) === 40.0)
    assert(r.getAs[Double](pa.minCol("m")) === 10.0)
    assert(r.getAs[Double](pa.maxCol("m")) === 30.0)
  }

  test("a fact missing a measure gets zero count and null aggregates") {
    val r = row("a") // a has no n values
    assert(r.getAs[Long](pa.cntCol("n")) === 0)
    assert(r.isNullAt(r.fieldIndex(pa.sumCol("n"))))
  }

  test("facts without any measure keep a row (count(*) must see them)") {
    assert(pa.df.count() === 4)
    val r = row("d")
    assert(r.isNullAt(r.fieldIndex(pa.sumCol("m"))))
  }

  test("non-measure attributes are ignored") {
    assert(!pa.df.columns.exists(_.contains("_k_")))
    assert(pa.df.columns.count(_.startsWith("m0_")) === 4)
    assert(pa.df.columns.count(_.startsWith("m1_")) === 4)
  }

  test("empty measure list yields just the fact column") {
    val pa2 = PreAgg.build(bag, facts, Nil)
    assert(pa2.df.columns.toSeq === Seq("fact"))
    assert(pa2.df.count() === 4)
  }

  test("column bookkeeping maps measures by index") {
    assert(pa.cntCol("m") === "m0_cnt" && pa.cntCol("n") === "m1_cnt")
    assert(pa.sumCol("n") === "m1_sum")
  }
}
