package repro.spade

import repro.SparkSpec
import repro.rdf.Triples

class AttributesSpec extends SparkSpec {
  import spark.implicits._

  private lazy val g = Triples.fromTuples(spark, Seq(
    ("a", "rdf:type", "T"),
    ("a", "age", "30"), ("a", "nat", "FR"), ("a", "nat", "DE"),
    ("a", "bio", "a long biography text"), ("a", "boss", "b"),
    ("b", "rdf:type", "T"), ("b", "age", "40"), ("b", "nat", "FR"),
    ("c", "rdf:type", "T"), ("c", "age", "xyz"),
  )).cache()
  private lazy val facts = Seq("a", "b", "c").toDF("fact").cache()
  private lazy val bag = Attributes.directBag(g, facts).cache()
  private lazy val stats = Attributes.computeStats(bag, Triples.subjects(g))

  test("directBag excludes rdf:type and keeps one row per triple") {
    assert(bag.count() === 8)
    assert(!bag.select("attr").distinct().collect().map(_.getString(0)).contains("rdf:type"))
  }

  test("support counts facts having the attribute") {
    assert(stats("age").support === 3)
    assert(stats("nat").support === 2)
    assert(stats("bio").support === 1)
  }

  test("multi-valued detection counts facts with >1 value") {
    assert(stats("nat").nMultiFacts === 1)
    assert(stats("nat").isMultiValued)
    assert(!stats("age").isMultiValued)
  }

  test("distinct values per attribute") {
    assert(stats("nat").nDistinct === 2)
    assert(stats("age").nDistinct === 3)
  }

  test("numeric detection tolerates no junk: 'xyz' breaks age's numericity") {
    assert(!stats("age").isNumeric)
    assert(stats("age").numericFrac > 0.5)
  }

  test("numeric min/max ignore unparseable values") {
    assert(stats("age").minNum.contains(30.0))
    assert(stats("age").maxNum.contains(40.0))
  }

  test("link detection: boss points to a subject of the graph") {
    assert(stats("boss").isLink)
    assert(!stats("nat").isLink)
  }

  test("text detection via space fraction") {
    assert(stats("bio").isText)
    assert(!stats("nat").isText)
    assert(!stats("boss").isText)
  }

  test("attribute table filters the bag") {
    val t = Attributes.table(bag, "nat").collect()
      .map(r => (r.getString(0), r.getString(1))).sorted
    assert(t.toSeq === Seq(("a", "DE"), ("a", "FR"), ("b", "FR")))
  }

  test("bag restricted to the CFS: facts outside are ignored") {
    val cfs = Seq("a").toDF("fact")
    val b2 = Attributes.directBag(g, cfs)
    assert(b2.count() === 5)
  }
}
