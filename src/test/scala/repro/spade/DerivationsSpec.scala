package repro.spade

import repro.SparkSpec
import repro.rdf.Triples

class DerivationsSpec extends SparkSpec {
  import spark.implicits._

  // CEO-flavored toy graph: multi-valued nationality, a company link with
  // properties (=> paths), an English and a French description.
  private lazy val g = Triples.fromTuples(spark, Seq(
    ("ceo1", "rdf:type", "CEO"),
    ("ceo1", "nationality", "FR"), ("ceo1", "nationality", "BR"),
    ("ceo1", "manages", "co1"), ("ceo1", "manages", "co2"),
    ("ceo1", "description", "the company oversees global petroleum production"),
    ("ceo2", "rdf:type", "CEO"),
    ("ceo2", "nationality", "AO"),
    ("ceo2", "manages", "co2"),
    ("ceo2", "description", "la croissance mondial de la entreprise"),
    ("co1", "area", "Petroleum"), ("co1", "hq", "Angola"),
    ("co2", "area", "Automotive"), ("co2", "area", "Banking"), ("co2", "hq", "France"),
  )).cache()
  private lazy val facts = Seq("ceo1", "ceo2").toDF("fact").cache()
  private lazy val bag = Attributes.directBag(g, facts).cache()
  private lazy val stats = Attributes.computeStats(bag, Triples.subjects(g))
  private val cfg = SpadeConfig()

  test("count derivation targets exactly the multi-valued properties") {
    val (rows, meta) = Derivations.countDerivations(bag, stats)
    assert(meta.map(_.name).toSet === Set("count(nationality)", "count(manages)"))
    val m = rows.get.collect().map(r => (r.getString(0), r.getString(1)) -> r.getString(2)).toMap
    assert(m(("count(nationality)", "ceo1")) === "2")
    assert(m(("count(nationality)", "ceo2")) === "1")
    assert(m(("count(manages)", "ceo1")) === "2")
  }

  test("keyword derivation splits text values into >=4-letter tokens") {
    val (rows, meta) = Derivations.keywordDerivations(bag, stats)
    assert(meta.map(_.name) === Seq("kw(description)"))
    val kws = rows.get.filter("fact = 'ceo1'").collect().map(_.getString(2)).toSet
    assert(kws.contains("petroleum"))
    assert(kws.contains("production"))
    assert(!kws.contains("the")) // too short
  }

  test("language derivation votes stopwords: en vs fr") {
    val (rows, _) = Derivations.langDerivations(bag, stats)
    val m = rows.get.collect().map(r => r.getString(1) -> r.getString(2)).toMap
    assert(m("ceo1") === "English")
    assert(m("ceo2") === "French")
  }

  test("path derivation follows links one hop: manages/area, manages/hq") {
    val (rows, meta) = Derivations.pathDerivations(g, bag, stats, cfg.maxPathsPerProp)
    assert(meta.map(_.name).toSet === Set("manages/area", "manages/hq"))
    val vals = rows.get.collect()
      .map(r => (r.getString(0), r.getString(1), r.getString(2))).toSet
    assert(vals.contains(("manages/area", "ceo1", "Petroleum")))
    assert(vals.contains(("manages/area", "ceo1", "Automotive"))) // via co2
    assert(vals.contains(("manages/area", "ceo2", "Banking")))
    assert(vals.contains(("manages/hq", "ceo2", "France")))
    // ceo2 does not manage co1:
    assert(!vals.contains(("manages/hq", "ceo2", "Angola")))
  }

  test("path values are fact-distinct even when several links share a value") {
    // ceo1 manages co1 (Petroleum) and co2 (Automotive, Banking): if both
    // companies shared an area, the derived attr keeps one row for it.
    val g2 = Triples.fromTuples(spark, Seq(
      ("x", "manages", "c1"), ("x", "manages", "c2"),
      ("c1", "area", "Same"), ("c2", "area", "Same")))
    val f2 = Seq("x").toDF("fact")
    val b2 = Attributes.directBag(g2, f2)
    val s2 = Attributes.computeStats(b2, Triples.subjects(g2))
    val (rows, _) = Derivations.pathDerivations(g2, b2, s2, 8)
    assert(rows.get.count() === 1)
  }

  test("maxPathsPerProp caps the enumerated paths by support") {
    val (_, meta) = Derivations.pathDerivations(g, bag, stats, 1)
    assert(meta.size === 1)
  }

  test("deriveAll combines all strategies with correct kinds") {
    val (rows, meta) = Derivations.deriveAll(g, bag, stats, cfg)
    val byKind = meta.groupBy(_.kind).map { case (k, v) => k.tag -> v.size }
    assert(byKind === Map("count" -> 2, "kw" -> 1, "lang" -> 1, "path" -> 2))
    assert(rows.get.count() > 0)
    // Every derived attr records its base property.
    assert(meta.forall(_.baseProp.nonEmpty))
  }

  test("no derivations on a purely relational-style graph (Airline shape)") {
    val g3 = Triples.fromTuples(spark, Seq(
      ("f1", "delay", "10"), ("f1", "carrier", "AA"),
      ("f2", "delay", "20"), ("f2", "carrier", "BB")))
    val f3 = Seq("f1", "f2").toDF("fact")
    val b3 = Attributes.directBag(g3, f3)
    val s3 = Attributes.computeStats(b3, Triples.subjects(g3))
    val (rows, meta) = Derivations.deriveAll(g3, b3, s3, cfg)
    assert(rows.isEmpty && meta.isEmpty)
  }
}
