package repro.rdf

import org.apache.spark.sql.functions._
import repro.SparkSpec

class RdfGenSpec extends SparkSpec {

  private def multiValuedProps(df: org.apache.spark.sql.DataFrame): Set[String] =
    df.filter(col("p") =!= Triples.TypeProperty)
      .groupBy("s", "p").count().filter(col("count") > 1)
      .select("p").distinct().collect().map(_.getString(0)).toSet

  test("generators are deterministic in (scale, seed)") {
    val a = RdfGen.airline(spark, 0.02).triples.collect().toSet
    val b = RdfGen.airline(spark, 0.02).triples.collect().toSet
    assert(a === b)
  }

  test("airline: relational shape — no multi-valued properties, no links, no text") {
    val d = RdfGen.airline(spark, 0.05)
    assert(multiValuedProps(d.triples).isEmpty)
    val subjects = Triples.subjects(d.triples)
    val objectsThatAreSubjects = d.triples
      .filter(col("p") =!= Triples.TypeProperty)
      .join(subjects.withColumnRenamed("fact", "o"), "o")
    assert(objectsThatAreSubjects.count() === 0)
    assert(Triples.types(d.triples) === Seq("Flight"))
  }

  test("ceos: multi-valued nationality and company areas exist") {
    val d = RdfGen.ceos(spark, 0.5)
    val mv = multiValuedProps(d.triples)
    assert(mv.contains("nationality"))
    assert(mv.contains("manages"))
    assert(Triples.types(d.triples).toSet === Set("CEO", "Company", "Politician"))
  }

  test("ceos: the planted Dos-Santos-style outlier is present") {
    val d = RdfGen.ceos(spark, 1.0)
    val top = Triples.attributeTable(d.triples, "netWorth")
      .select(max(col("value").cast("double"))).collect()(0).getDouble(0)
    assert(top === 2.8e9)
  }

  test("dblp: publications link to venues; titles are texty") {
    val d = RdfGen.dblp(spark, 0.05)
    val venues = Triples.nodesOfType(d.triples, "Venue")
    val links = Triples.attributeTable(d.triples, "publishedIn")
      .join(venues.withColumnRenamed("fact", "value"), "value")
    assert(links.count() > 0)
    assert(multiValuedProps(d.triples).contains("author"))
  }

  test("foodista: recipes have no numeric direct property (A_woD must be 0)") {
    val d = RdfGen.foodista(spark, 0.2)
    val recipeProps = d.triples
      .join(Triples.nodesOfType(d.triples, "Recipe").withColumnRenamed("fact", "s"), "s")
      .filter(col("p") =!= Triples.TypeProperty)
      .select("p").distinct().collect().map(_.getString(0)).toSet
    assert(recipeProps === Set("recipeTitle", "ingredient"))
  }

  test("nasa: launches reference spacecraft; planted heavy-crew masses") {
    val d = RdfGen.nasa(spark, 0.5)
    assert(multiValuedProps(d.triples).contains("spacecraft"))
    val heavy = Triples.attributeTable(d.triples, "mass")
      .select(max(col("value").cast("double"))).collect()(0).getDouble(0)
    assert(heavy > 20000)
  }

  test("nobel: laureates link to prizes with categories and years") {
    val d = RdfGen.nobel(spark, 0.3)
    val prizes = Triples.nodesOfType(d.triples, "Prize")
    assert(prizes.count() > 0)
    assert(Triples.properties(d.triples).contains("prizeCategory"))
  }

  test("all real-graph analogs materialize at tiny scale") {
    RdfGen.realGraphs(spark, 0.05).foreach { d =>
      assert(d.triples.count() > 100, d.name)
      assert(d.paperRow.nonEmpty, d.name)
    }
  }

  test("benchmark: fact count, dimension cardinality caps and measures") {
    val g = RdfGen.benchmark(spark, 1000, Seq(10, 5), 2, sparsity = 1.0)
    assert(Triples.nodesOfType(g, "Fact").count() === 1000)
    val d0 = Triples.attributeTable(g, "dim0").select("value").distinct().count()
    val d1 = Triples.attributeTable(g, "dim1").select("value").distinct().count()
    assert(d0 <= 10 && d1 <= 5)
    assert(Triples.properties(g).toSet ===
      Set("dim0", "dim1", "measure0", "measure1"))
  }

  test("benchmark: sparsity bounds the number of occupied cells") {
    val g = RdfGen.benchmark(spark, 2000, Seq(20, 20), 0, sparsity = 0.1)
    val cells = Triples.attributeTable(g, "dim0")
      .withColumnRenamed("value", "v0")
      .join(Triples.attributeTable(g, "dim1").withColumnRenamed("value", "v1"), "fact")
      .select("v0", "v1").distinct().count()
    assert(cells <= 40) // 0.1 × 400
  }

  test("benchmark: multiValuedFrac=0 means single-valued dimensions") {
    val g = RdfGen.benchmark(spark, 500, Seq(5, 5), 1, sparsity = 1.0)
    assert(multiValuedProps(g).isEmpty)
  }

  test("benchmark: multiValuedFrac>0 makes dimensions multi-valued") {
    val g = RdfGen.benchmark(spark, 500, Seq(5, 5), 1, sparsity = 1.0,
                             multiValuedFrac = 0.5)
    val mv = multiValuedProps(g)
    assert(mv.contains("dim0") || mv.contains("dim1"))
  }
}
