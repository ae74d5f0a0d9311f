package repro.spade

import repro.SparkSpec

class EnumerationSpec extends SparkSpec {
  import spark.implicits._

  private def stats(support: Long, distinct: Long, numeric: Boolean = false,
                    multi: Long = 0, link: Boolean = false, text: Boolean = false) =
    AttrStats(support, multi, distinct,
              numericFrac = if (numeric) 1.0 else 0.0,
              linkFrac = if (link) 1.0 else 0.0,
              spaceFrac = if (text) 1.0 else 0.0,
              minNum = if (numeric) Some(0) else None,
              maxNum = if (numeric) Some(9) else None)

  private def direct(name: String, st: AttrStats) = name -> AttrInfo(name, AttrKind.Direct, None, st)
  private val cfg = SpadeConfig(minSupportFrac = 0.5, maxDistinctDim = 10, maxLatticeDims = 3)

  test("classify: frequent low-cardinality attributes become dimensions") {
    val attrs = Map(
      direct("good", stats(80, 5)),
      direct("rare", stats(10, 3)),           // support below 50%
      direct("id", stats(100, 90)),           // too many distinct values
      direct("const", stats(100, 1)),         // single value: useless
      direct("linky", stats(100, 5, link = true)),
      direct("texty", stats(100, 5, text = true)),
    )
    val pool = Enumeration.classify(attrs, 100, cfg)
    assert(pool.dims === Seq("good"))
  }

  test("classify: frequent numeric attributes become measures") {
    val attrs = Map(
      direct("m1", stats(80, 50, numeric = true)),
      direct("m2", stats(10, 50, numeric = true)), // infrequent
      direct("cat", stats(80, 5)),
    )
    val pool = Enumeration.classify(attrs, 100, cfg)
    assert(pool.measures === Seq("m1"))
  }

  test("classify: a numeric attribute with few values can be dim AND measure") {
    val attrs = Map(direct("month", stats(100, 10, numeric = true)))
    val pool = Enumeration.classify(attrs, 100, cfg)
    assert(pool.dims === Seq("month") && pool.measures === Seq("month"))
  }

  test("factAttrSets aggregates per-fact dimension sets with counts") {
    val bag = Seq(
      ("a", "f1", "x"), ("b", "f1", "y"),
      ("a", "f2", "x"), ("b", "f2", "y"),
      ("a", "f3", "x"),
      ("a", "f3", "z"), // second value must not duplicate the set
    ).toDF("attr", "fact", "value")
    val sets = Enumeration.factAttrSets(bag, Seq("a", "b")).toMap
    assert(sets === Map(Set("a", "b") -> 2L, Set("a") -> 1L))
  }

  test("maximal frequent sets: subsets of frequent sets are not maximal") {
    val attrs = Map(direct("a", stats(10, 3)), direct("b", stats(9, 3)),
                    direct("c", stats(2, 3)))
    val pool = Enumeration.Pool(attrs, Seq("a", "b", "c"), Nil)
    val setCounts = Seq((Set("a", "b"), 8L), (Set("a"), 2L), (Set("b", "c"), 1L), (Set("c"), 1L))
    val mfs = Enumeration.maximalFrequentSets(pool, setCounts, 10, cfg)
    assert(mfs === Seq(Set("a", "b"))) // {a},{b} frequent but subsumed; {c} infrequent
  }

  test("maximal frequent sets respect maxLatticeDims") {
    val names = Seq("a", "b", "c", "d")
    val attrs = names.map(n => direct(n, stats(10, 3))).toMap
    val pool = Enumeration.Pool(attrs, names, Nil)
    val setCounts = Seq((names.toSet, 10L))
    val mfs = Enumeration.maximalFrequentSets(pool, setCounts, 10, cfg)
    assert(mfs.nonEmpty && mfs.forall(_.size === 3)) // capped at 3 dims
    assert(mfs.size === 4) // all C(4,3) subsets are maximal at the cap
  }

  test("derived-from conflicts are pruned from candidate dimension sets") {
    val attrs = Map(
      direct("nationality", stats(10, 3)),
      "count(nationality)" -> AttrInfo("count(nationality)", AttrKind.CountOf,
                                       Some("nationality"), stats(10, 3, numeric = true)),
    )
    val pool = Enumeration.Pool(attrs, Seq("count(nationality)", "nationality"), Nil)
    val setCounts = Seq((Set("nationality", "count(nationality)"), 10L))
    val mfs = Enumeration.maximalFrequentSets(pool, setCounts, 10, cfg)
    assert(mfs.toSet === Set(Set("nationality"), Set("count(nationality)")))
  }

  test("lattices: measures exclude the dims and their derivation relatives") {
    val attrs = Map(
      direct("nationality", stats(10, 3)),
      "count(nationality)" -> AttrInfo("count(nationality)", AttrKind.CountOf,
                                       Some("nationality"), stats(10, 3, numeric = true)),
      direct("age", stats(10, 8, numeric = true)),
    )
    val pool = Enumeration.Pool(attrs, Seq("nationality"), Seq("age", "count(nationality)"))
    val setCounts = Seq((Set("nationality"), 10L))
    val specs = Enumeration.lattices(pool, setCounts, 10, cfg)
    assert(specs === Seq(LatticeSpec(Seq("nationality"), Seq("age"))))
  }

  test("mdaKeys: count(*) per node plus 4 fns per measure, shared nodes once") {
    val specs = Seq(
      LatticeSpec(Seq("a", "b"), Seq("m1")),
      LatticeSpec(Seq("b", "c"), Seq("m1", "m2")))
    val keys = Enumeration.mdaKeys("cfs", specs)
    // lattice 1: nodes {a,b},{a},{b} × (1 + 4)           = 15
    // lattice 2: nodes {b,c},{b},{c} × (1 + 8)           = 27
    // shared node {b}: count + m1 fns counted once       = -5
    assert(keys.size === 15 + 27 - 5)
    assert(keys.contains(MdaKey("cfs", Seq("b"), "m1", AggFn.Sum)))
    assert(!keys.contains(MdaKey("cfs", Seq("a"), "m2", AggFn.Sum)))
  }
}
