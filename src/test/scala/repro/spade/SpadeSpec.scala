package repro.spade

import repro.SparkSpec
import repro.core.{Arm, Interestingness}
import repro.rdf.{RdfGen, Triples}

/** End-to-end pipeline tests on small synthetic graphs. */
class SpadeSpec extends SparkSpec {

  private val smallCfg = SpadeConfig(minCfsSize = 50, maxCfs = 4, maxLattices = 2,
                                     maxLatticeDims = 2, k = 5)

  test("CfsSelector: type-based CFSs appear, deduplicated against summary") {
    val d = RdfGen.airline(spark, 0.02)
    val cfss = CfsSelector.select(d.triples, smallCfg)
    // Airline: all flights share one property set => type CFS == summary CFS,
    // deduplication keeps exactly one.
    assert(cfss.size === 1)
    assert(cfss.head.size === 240)
  }

  test("CfsSelector: property-based CFSs honor the requested property set") {
    val d = RdfGen.ceos(spark, 1.0)
    // gender is present on ~70% of CEOs, so this fact set coincides with no
    // type- or summary-based CFS and survives deduplication.
    val cfss = CfsSelector.select(d.triples, smallCfg.copy(maxCfs = 10),
                                  propertySets = Seq(Seq("gender", "netWorth")))
    assert(cfss.exists(_.name.startsWith("props:")))
  }

  test("prepare on Airline: one CFS, no derived properties") {
    val d = RdfGen.airline(spark, 0.02)
    val p = Spade.prepare(spark, d.name, d.triples, smallCfg)
    assert(p.cfss.size === 1)
    assert(p.derivedByKind.values.sum === 0)
    assert(p.nMdas > 0)
    p.unpersist()
  }

  test("prepare on Foodista shape: zero MDAs without derivations, some with") {
    val d = RdfGen.foodista(spark, 0.2)
    val woD = Spade.prepare(spark, d.name, d.triples,
                            smallCfg.copy(deriveProperties = false))
    val wD = Spade.prepare(spark, d.name, d.triples, smallCfg)
    val recipeWoD = woD.cfss.filter(_.cfs.name == "type:Recipe")
    assert(recipeWoD.forall(_.lattices.isEmpty),
      "recipes must yield no lattices without derivations")
    val recipeWD = wD.cfss.filter(_.cfs.name == "type:Recipe")
    assert(recipeWD.exists(_.lattices.nonEmpty),
      "derivations must unlock recipe lattices")
    assert(wD.nMdas > woD.nMdas)
    woD.unpersist(); wD.unpersist()
  }

  test("derivations increase the MDA space on CEOs (paper R1)") {
    val d = RdfGen.ceos(spark, 0.7)
    val woD = Spade.prepare(spark, d.name, d.triples,
                            smallCfg.copy(deriveProperties = false))
    val wD = Spade.prepare(spark, d.name, d.triples, smallCfg)
    assert(wD.nMdas > woD.nMdas)
    assert(wD.derivedByKind("path") > 0)
    assert(wD.derivedByKind("count") > 0)
    woD.unpersist(); wD.unpersist()
  }

  test("end-to-end: the planted outlier aggregate ranks first") {
    // One type, one dimension with a massive group-sum outlier.
    val rnd = new scala.util.Random(3)
    val ts = (0 until 400).flatMap { i =>
      val s = s"e$i"
      Seq((s, "rdf:type", "E"),
          (s, "grp", s"g${i % 5}"),
          // group g0 carries huge values => sum/avg by grp has high variance
          (s, "v", f"${if (i % 5 == 0) 1e6 + rnd.nextGaussian() else rnd.nextGaussian()}%.3f"),
          (s, "flat", f"${5.0 + rnd.nextGaussian() * 0.01}%.4f"))
    }
    val g = Triples.fromTuples(spark, ts)
    val res = Spade.run(spark, "planted", g,
                        smallCfg.copy(minCfsSize = 10, k = 3))
    assert(res.topK.nonEmpty)
    val (topKey, topScore) = res.topK.head
    assert(topKey.measure === "v", s"expected measure v on top, got $topKey")
    assert(topScore > 0)
    res.prepared.unpersist()
  }

  test("evaluateAll with and without early-stop agree on top-1") {
    val d = RdfGen.nasa(spark, 0.25)
    val p = Spade.prepare(spark, d.name, d.triples, smallCfg)
    val full = new Arm(Interestingness.Variance)
    Spade.evaluateAll(p, full, None, k = 3)
    val es = new Arm(Interestingness.Variance)
    val totals = Spade.evaluateAll(p, es, Some(EsConfig()), k = 3)
    assert(full.topK(1).map(_._1) === es.topK(1).map(_._1))
    assert(totals.evaluatedMdas + totals.prunedMdas + totals.reusedMdas > 0)
    p.unpersist()
  }

  test("cross-lattice reuse: shared nodes are evaluated once") {
    val d = RdfGen.ceos(spark, 0.7)
    val p = Spade.prepare(spark, d.name, d.triples,
                          smallCfg.copy(maxLattices = 4, maxLatticeDims = 3))
    val arm = new Arm(Interestingness.Variance)
    val totals = Spade.evaluateAll(p, arm, None, k = 5)
    val distinctKeys = p.cfss.flatMap(_.mdaKeys).size
    assert(arm.evaluatedCount <= distinctKeys)
    // Evaluated set must exactly cover the enumerated MDAs (minus those
    // with degenerate empty results, which still get an entry).
    assert(totals.reusedMdas >= 0)
    p.unpersist()
  }

  test("run returns k results ordered by score") {
    val d = RdfGen.nobel(spark, 0.2)
    val res = Spade.run(spark, d.name, d.triples, smallCfg.copy(k = 5))
    val scores = res.topK.map(_._2)
    assert(scores === scores.sorted(Ordering[Double].reverse))
    assert(res.topK.size <= 5)
    res.prepared.unpersist()
  }

  test("timings are recorded for every pipeline step") {
    val d = RdfGen.foodista(spark, 0.1)
    val p = Spade.prepare(spark, d.name, d.triples, smallCfg)
    assert(p.timingsMs.keySet === Set("cfsSelection", "attributeAnalysis",
                                      "aggregateEnumeration", "measurePreAggregation"))
    p.unpersist()
  }
}
