package repro.summary

import repro.SparkSpec
import repro.rdf.Triples

class SummarySpec extends SparkSpec {

  private lazy val g = Triples.fromTuples(spark, Seq(
    ("a", "rdf:type", "T"), ("a", "p1", "1"), ("a", "p2", "2"),
    ("b", "rdf:type", "T"), ("b", "p1", "1"), ("b", "p2", "9"),
    ("c", "p2", "3"), ("c", "p1", "4"),
    ("d", "p1", "1"),
  )).cache()

  test("characteristic sets group nodes by their exact property set") {
    val cs = Summary.characteristicSets(g).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    assert(cs("a") === "p1|p2")
    assert(cs("b") === "p1|p2")
    assert(cs("c") === "p1|p2") // type triples are ignored
    assert(cs("d") === "p1")
  }

  test("classes respect minSize and are largest-first") {
    assert(Summary.classes(g, 2) === Seq(("p1|p2", 3L)))
    assert(Summary.classes(g, 1) === Seq(("p1|p2", 3L), ("p1", 1L)))
  }

  test("classMembers returns exactly the class' facts") {
    val m = Summary.classMembers(g, "p1|p2").collect().map(_.getString(0)).sorted
    assert(m.toSeq === Seq("a", "b", "c"))
  }

  test("multi-valued properties appear once in the characteristic set") {
    val g2 = Triples.fromTuples(spark, Seq(
      ("x", "p", "1"), ("x", "p", "2"), ("x", "q", "3")))
    val cs = Summary.characteristicSets(g2).collect().head.getString(1)
    assert(cs === "p|q")
  }
}
