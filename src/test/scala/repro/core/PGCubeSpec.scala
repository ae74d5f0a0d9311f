package repro.core

import repro.{Fixtures, SparkSpec}
import repro.Fixtures._
import repro.spade._

/** PGCube baseline behavior: it must reproduce exactly the errors the paper
  * analyses (§4.2, Lemma 1) — double counting under multi-valued dimensions,
  * `count(distinct)` fixing counts but not sums/averages — and must agree
  * with MVDCube when no dimension is multi-valued.
  */
class PGCubeSpec extends SparkSpec {

  private val cfs = "ceos"
  private lazy val c = ctx(spark, ceoBagRows(withAges = true), Seq("n1", "n2"),
                           Seq("age", "netWorth"))
  private lazy val spec =
    LatticeSpec(Seq("company/area", "gender", "nationality"), Seq("age", "netWorth"))
  private lazy val mvd  = evalLattice(cfs, c, spec)
  private lazy val star = PGCube.evaluateLattice(cfs, spec, c.bag, c.facts, c.preAgg,
                                                 countDistinctFacts = false)
  private lazy val dist = PGCube.evaluateLattice(cfs, spec, c.bag, c.facts, c.preAgg,
                                                 countDistinctFacts = true)

  test("PGCube* A4: five CEOs managing Manufacturer companies (the paper's bug)") {
    val m = star(key(cfs, Seq("company/area"), "*", AggFn.Count)).toMap
    assert(m("Manufacturer") === 5.0) // correct value is 2
    assert(m("Automotive") === 4.0)   // correct value is 1
  }

  test("PGCube* A3: three female CEOs (correct: one)") {
    val m = star(key(cfs, Seq("gender"), "*", AggFn.Count)).toMap
    assert(m("Female") === 3.0)
  }

  test("PGCube^d counts are correct (count distinct fixes Example 3)") {
    val m = dist(key(cfs, Seq("company/area"), "*", AggFn.Count)).toMap
    assert(m("Manufacturer") === 2.0)
    assert(m("Automotive") === 1.0)
    val g = dist(key(cfs, Seq("gender"), "*", AggFn.Count)).toMap
    assert(g("Female") === 1.0)
  }

  test("Variation 1: both PGCube variants overstate sum(netWorth) by area") {
    for (r <- Seq(star, dist)) {
      val m = r(key(cfs, Seq("company/area"), "netWorth", AggFn.Sum)).toMap
      assert(m("Manufacturer") === 2.8e9 + 4 * 1.2e8) // $3.28B, correct $2.92B
    }
  }

  test("Variation 2: both PGCube variants distort avg(age) by area") {
    for (r <- Seq(star, dist)) {
      val m = r(key(cfs, Seq("company/area"), "age", AggFn.Avg)).toMap
      assert(math.abs(m("Manufacturer") - (47.0 + 4 * 66.0) / 5) < 1e-9) // 62.2, correct 56.5
    }
  }

  test("min/max stay correct in PGCube (duplication cannot change them)") {
    for (r <- Seq(star, dist); f <- Seq(AggFn.Min, AggFn.Max)) {
      val pg = r(key(cfs, Seq("company/area"), "netWorth", f))
      val ok = mvd.result(key(cfs, Seq("company/area"), "netWorth", f)).get
      assert(ResultDiff.equal(pg, ok), s"min/max mismatch for $f")
    }
  }

  test("PGCube root node (all dims) is correct — errors only below the root") {
    val root = spec.dims
    for ((m, f) <- Seq(("*", AggFn.Count), ("netWorth", AggFn.Sum), ("age", AggFn.Avg))) {
      val pg = star(key(cfs, root, m, f))
      val ok = mvd.result(key(cfs, root, m, f)).get
      assert(ResultDiff.equal(pg, ok), s"root mismatch for $f($m)")
    }
  }

  test("error ratios: PGCube values are >= the correct ones for count/sum") {
    for ((m, f) <- Seq(("*", AggFn.Count), ("netWorth", AggFn.Sum));
         node <- Seq(Seq("company/area"), Seq("gender"), Seq("nationality"))) {
      val ratios = ResultDiff.errorRatios(
        mvd.result(key(cfs, node, m, f)).get, star(key(cfs, node, m, f)))
      assert(ratios.forall(_ >= 1.0 - 1e-12),
        s"PGCube produced a value below the correct one for $f($m) on $node: $ratios")
    }
  }

  test("Lemma 1 converse: single-valued data => PGCube* equals MVDCube everywhere") {
    val rows = Seq(
      ("d1", "a", "x"), ("d2", "a", "u"), ("m", "a", "10"),
      ("d1", "b", "x"), ("d2", "b", "v"), ("m", "b", "20"),
      ("d1", "c", "y"), ("m", "c", "40"), // d2 missing: heterogeneity is fine
      ("d1", "d", "y"), ("d2", "d", "v"))
    val cc = ctx(spark, rows, Seq("a", "b", "c", "d"), Seq("m"))
    val sp = LatticeSpec(Seq("d1", "d2"), Seq("m"))
    val ok = evalLattice("sv", cc, sp)
    val pg = PGCube.evaluateLattice("sv", sp, cc.bag, cc.facts, cc.preAgg,
                                    countDistinctFacts = false)
    for ((k, r) <- pg) {
      assert(ok.result(k).isDefined, s"missing MVDCube result for $k")
      assert(ResultDiff.equal(r, ok.result(k).get), s"mismatch at $k")
    }
  }

  test("multi-valued benchmark graph: PGCube^d wrong on sums, right on counts") {
    import repro.rdf.{RdfGen, Triples}
    val g = RdfGen.benchmark(spark, 500, Seq(4, 3), 1, sparsity = 1.0,
                             multiValuedFrac = 0.4, seed = 5)
    val facts = Triples.nodesOfType(g, "Fact")
    val bag = Attributes.directBag(g, facts).cache()
    val cc = Ctx(bag, facts.cache(), PreAgg.build(bag, facts, Seq("measure0")),
                 Attributes.computeStats(bag, Triples.subjects(g)))
    val sp = LatticeSpec(Seq("dim0", "dim1"), Seq("measure0"))
    val ok = evalLattice("bench", cc, sp)
    val pg = PGCube.evaluateLattice("bench", sp, cc.bag, cc.facts, cc.preAgg,
                                    countDistinctFacts = true)
    // counts agree everywhere
    for (node <- Seq(Seq("dim0", "dim1"), Seq("dim0"), Seq("dim1"))) {
      val k = key("bench", node, "*", AggFn.Count)
      assert(ResultDiff.equal(pg(k), ok.result(k).get), s"count mismatch at $node")
    }
    // at least one single-dim sum is inflated
    val wrongSums = Seq(Seq("dim0"), Seq("dim1")).count { node =>
      val k = key("bench", node, "measure0", AggFn.Sum)
      !ResultDiff.equal(pg(k), ok.result(k).get)
    }
    assert(wrongSums >= 1, "expected multi-valued dims to corrupt PGCube sums")
  }
}
