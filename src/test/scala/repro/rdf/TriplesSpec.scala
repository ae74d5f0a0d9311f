package repro.rdf

import repro.SparkSpec

class TriplesSpec extends SparkSpec {

  private lazy val g = Triples.fromTuples(spark, Seq(
    ("a", "rdf:type", "CEO"), ("a", "name", "A"), ("a", "knows", "b"),
    ("b", "rdf:type", "CEO"), ("b", "rdf:type", "Person"), ("b", "name", "B"),
    ("c", "name", "C"), ("c", "age", "10"),
  )).cache()

  test("properties excludes rdf:type and is sorted") {
    assert(Triples.properties(g) === Seq("age", "knows", "name"))
  }

  test("types lists distinct types") {
    assert(Triples.types(g) === Seq("CEO", "Person"))
  }

  test("typeTable yields one row per (node, type)") {
    assert(Triples.typeTable(g).count() === 3)
  }

  test("nodesOfType returns members once, even with several types") {
    assert(Triples.nodesOfType(g, "CEO").collect().map(_.getString(0)).sorted
           === Array("a", "b"))
    assert(Triples.nodesOfType(g, "Person").count() === 1)
  }

  test("nodesWithProperties intersects property holders") {
    val ids = Triples.nodesWithProperties(g, Seq("name", "age"))
      .collect().map(_.getString(0))
    assert(ids.toSeq === Seq("c"))
  }

  test("attributeTable projects (fact, value) pairs of one property") {
    val t = Triples.attributeTable(g, "name").collect()
      .map(r => (r.getString(0), r.getString(1))).sorted
    assert(t.toSeq === Seq(("a", "A"), ("b", "B"), ("c", "C")))
  }

  test("subjects returns each subject once") {
    assert(Triples.subjects(g).count() === 3)
  }
}
