package repro.core

import repro.{Fixtures, SparkSpec}
import repro.Fixtures._
import repro.spade._

/** MVDCube correctness on the paper's running example (Figure 1, Figure 4,
  * Variations 1-2) plus full DuckDB-oracle equivalence for every node ×
  * measure × function of several lattices.
  */
class MVDCubeSpec extends SparkSpec {

  private val cfs = "ceos"
  private val ex3dims = Seq("company/area", "gender", "nationality") // sorted
  private lazy val ctxAges = ctx(spark, ceoBagRows(withAges = true), Seq("n1", "n2"),
                                 Seq("age", "netWorth"))
  private lazy val ex3spec = LatticeSpec(ex3dims, Seq("age", "netWorth"))
  private lazy val armAges = evalLattice(cfs, ctxAges, ex3spec)

  // --- Example 3 (count of CEOs), Figure 4 ------------------------------

  test("A1 (root, 3 dims): 11 tuples, each counting one CEO (Figure 4)") {
    val m = resultMap(armAges, key(cfs, ex3dims, "*", AggFn.Count))
    // n2 has no gender => its root groups are null-gender and thus excluded
    // from the *result* (kept internally for children): 3 tuples remain.
    assert(m.size === 3)
    assert(m(gk("Diamond", "Female", "Angola")) === 1.0)
    assert(m(gk("Manufacturer", "Female", "Angola")) === 1.0)
    assert(m(gk("NaturalGas", "Female", "Angola")) === 1.0)
  }

  test("A2 (gender, company/area): each group counts each CEO once") {
    val m = resultMap(armAges, key(cfs, Seq("company/area", "gender"), "*", AggFn.Count))
    assert(m === Map(
      gk("Diamond", "Female") -> 1.0,
      gk("Manufacturer", "Female") -> 1.0,
      gk("NaturalGas", "Female") -> 1.0))
  }

  test("A4 (company/area): Manufacturer counts 2 CEOs, not 5 (paper §4.2)") {
    val m = resultMap(armAges, key(cfs, Seq("company/area"), "*", AggFn.Count))
    assert(m === Map(
      "Diamond" -> 1.0, "Manufacturer" -> 2.0, "NaturalGas" -> 1.0, "Automotive" -> 1.0))
  }

  test("A3 (gender): one female CEO, not 3 (paper §4.2)") {
    val m = resultMap(armAges, key(cfs, Seq("gender"), "*", AggFn.Count))
    assert(m === Map("Female" -> 1.0))
  }

  test("nationality node: every nationality counts its CEO once") {
    val m = resultMap(armAges, key(cfs, Seq("nationality"), "*", AggFn.Count))
    assert(m === Map("Angola" -> 1.0, "Nigeria" -> 1.0, "France" -> 1.0,
                     "Lebanon" -> 1.0, "Brazil" -> 1.0))
  }

  // --- Variation 1: sum of net worth ------------------------------------

  test("Variation 1: sum(netWorth) by company/area counts each CEO once") {
    val m = resultMap(armAges, key(cfs, Seq("company/area"), "netWorth", AggFn.Sum))
    assert(m("Manufacturer") === 2.92e9) // 2.8B + 120M, not 2.8B + 4×120M
    assert(m("Diamond") === 2.8e9)
    assert(m("NaturalGas") === 2.8e9)
    assert(m("Automotive") === 1.2e8)
  }

  // --- Variation 2: average age ------------------------------------------

  test("Variation 2: avg(age) by company/area averages over facts, not rows") {
    val m = resultMap(armAges, key(cfs, Seq("company/area"), "age", AggFn.Avg))
    assert(m("Manufacturer") === (47.0 + 66.0) / 2) // not (47 + 4×66)/5
    assert(m("Automotive") === 66.0)
    assert(m("Diamond") === 47.0)
  }

  // --- Example 1 and Example 2 -------------------------------------------

  test("Example 1: sum(netWorth) by countryOfOrigin = {(Angola, $2.8B)}") {
    val c = ctx(spark, ceoBagRows(withAges = false), Seq("n1", "n2"), Seq("netWorth"))
    val arm = evalLattice(cfs, c, LatticeSpec(Seq("countryOfOrigin"), Seq("netWorth")))
    val m = resultMap(arm, key(cfs, Seq("countryOfOrigin"), "netWorth", AggFn.Sum))
    assert(m === Map("Angola" -> 2.8e9)) // n2 lacks the dimension entirely
  }

  test("Example 2: avg(age) by nationality yields 65 for each of n2's four") {
    val c = ctx(spark, ceoBagRows(withAges = false), Seq("n1", "n2"), Seq("age"))
    val arm = evalLattice(cfs, c, LatticeSpec(Seq("nationality"), Seq("age")))
    val m = resultMap(arm, key(cfs, Seq("nationality"), "age", AggFn.Avg))
    // n1 has both dims but no age measure => contributes no value; its
    // Angola group has no aggregated value and is absent.
    assert(m === Map("Nigeria" -> 65.0, "France" -> 65.0,
                     "Lebanon" -> 65.0, "Brazil" -> 65.0))
  }

  // --- min/max and count coherence ---------------------------------------

  test("min/max netWorth per company/area are per-fact min/max combinations") {
    val mn = resultMap(armAges, key(cfs, Seq("company/area"), "netWorth", AggFn.Min))
    val mx = resultMap(armAges, key(cfs, Seq("company/area"), "netWorth", AggFn.Max))
    assert(mn("Manufacturer") === 1.2e8)
    assert(mx("Manufacturer") === 2.8e9)
    assert(mn("Diamond") === 2.8e9)
  }

  test("a fact with every dimension missing never reaches any node result") {
    val rows = ceoBagRows(withAges = true) ++ Seq(("netWorth", "n3", "7"))
    val c = ctx(spark, rows, Seq("n1", "n2", "n3"), Seq("netWorth"))
    val arm = evalLattice(cfs, c, LatticeSpec(Seq("gender", "nationality"), Seq("netWorth")))
    val m = resultMap(arm, key(cfs, Seq("nationality"), "*", AggFn.Count))
    assert(m.values.sum === 5.0) // n3 contributes nowhere
  }

  // --- full oracle equivalence over the example lattice -------------------

  for {
    node <- Seq(Seq("company/area", "gender", "nationality"),
                Seq("company/area", "gender"), Seq("company/area", "nationality"),
                Seq("gender", "nationality"),
                Seq("company/area"), Seq("gender"), Seq("nationality"))
    (m, fn) <- Seq(("*", AggFn.Count)) ++
      (for (mm <- Seq("age", "netWorth"); f <- AggFn.measureFns) yield (mm, f))
  } test(s"oracle: example lattice node=[${node.mkString(",")}] ${fn.name}($m)") {
    oracleCheckNode(spark, ctxAges, cfs, ex3spec, armAges, node, m, fn)
  }

  // --- oracle equivalence on a messier generated bag ----------------------

  private lazy val messyBag: Seq[(String, String, String)] = {
    val rnd = new scala.util.Random(7)
    (0 until 120).flatMap { i =>
      val f = s"f$i"
      val dims = Seq("da", "db", "dc").flatMap { d =>
        // 0..2 values per dimension: missing AND multi-valued dims abound.
        (0 until rnd.nextInt(3)).map(_ => (d, f, s"${d}_v${rnd.nextInt(4)}"))
      }.distinct
      val meas = Seq("mx", "my").flatMap { mm =>
        (0 until rnd.nextInt(3)).map(_ => (mm, f, f"${rnd.nextDouble() * 100}%.3f"))
      }
      dims ++ meas
    }
  }
  private lazy val messyCtx = ctx(spark, messyBag, (0 until 120).map(i => s"f$i"),
                                  Seq("mx", "my"))
  private lazy val messySpec = LatticeSpec(Seq("da", "db", "dc"), Seq("mx", "my"))
  private lazy val messyArm = evalLattice("messy", messyCtx, messySpec)

  for {
    node <- Seq(Seq("da", "db", "dc"), Seq("da", "db"), Seq("da", "dc"),
                Seq("db", "dc"), Seq("da"), Seq("db"), Seq("dc"))
    (m, fn) <- Seq(("*", AggFn.Count)) ++
      (for (mm <- Seq("mx", "my"); f <- AggFn.measureFns) yield (mm, f))
  } test(s"oracle: messy lattice node=[${node.mkString(",")}] ${fn.name}($m)") {
    oracleCheckNode(spark, messyCtx, "messy", messySpec, messyArm, node, m, fn)
  }

  // --- differential check: expansion-based vs MMST-chained evaluation -----

  test("evaluateLattice (expand) and evaluateLatticeChained (MMST) agree") {
    val chained = new Arm(Interestingness.Variance)
    MVDCube.evaluateLatticeChained("messy", messySpec, messyCtx.bag, messyCtx.facts,
                                   messyCtx.preAgg, messyCtx.stats, chained)
    val expandKeys = messyArm.all.map(_._1).toSet
    val chainedKeys = chained.all.map(_._1).toSet
    assert(expandKeys === chainedKeys)
    expandKeys.foreach { k =>
      assert(ResultDiff.equal(messyArm.result(k).get, chained.result(k).get),
        s"chained/expand mismatch at $k")
    }
  }
}
