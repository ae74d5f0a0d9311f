package repro.spade

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.rdf.Triples

/** Attribute analysis (paper §3, Offline + Online Attribute Analysis).
  *
  * All attributes of one CFS — direct properties and derived ones — are kept
  * in a single **attribute bag** `DataFrame(attr, fact, value)`. This makes
  * per-attribute statistics one aggregation instead of one job per attribute
  * and is the Spark analog of the paper's per-attribute `(s, o)` tables.
  */
object Attributes {

  /** Direct (non-type) properties of the CFS facts as a bag. */
  def directBag(triples: DataFrame, facts: DataFrame): DataFrame =
    triples.filter(col("p") =!= Triples.TypeProperty)
      .join(facts.withColumnRenamed("fact", "s").hint("shuffle_hash"), "s")
      .select(col("p").as("attr"), col("s").as("fact"), col("o").as("value"))

  /** The `(fact, value)` table of one attribute of the bag. */
  def table(bag: DataFrame, attr: String): DataFrame =
    bag.filter(col("attr") === attr).select("fact", "value")

  /** Per-attribute statistics over the bag, in two aggregations plus a
    * link-detection join against the graph's subjects.
    */
  def computeStats(bag: DataFrame, graphSubjects: DataFrame): Map[String, AttrStats] = {
    val perFact = bag.groupBy("attr", "fact").agg(count("value").as("cnt"))
    val multiStats = perFact.groupBy("attr").agg(
      count(lit(1)).as("support"),
      sum(when(col("cnt") > 1, 1L).otherwise(0L)).as("nMulti"))

    val withLink = bag.join(
      graphSubjects.select(col("fact").as("value")).distinct().withColumn("isSubj", lit(1)),
      Seq("value"), "left")
    // try_cast: Spark 4 runs ANSI SQL — a plain cast would throw on the
    // (expected) non-numeric values instead of probing them.
    val num = expr("try_cast(value AS DOUBLE)")
    val valueStats = withLink.groupBy("attr").agg(
      countDistinct("value").as("nDistinct"),
      avg(when(num.isNotNull, 1.0).otherwise(0.0)).as("numericFrac"),
      avg(when(col("isSubj").isNotNull, 1.0).otherwise(0.0)).as("linkFrac"),
      avg(when(col("value").contains(" "), 1.0).otherwise(0.0)).as("spaceFrac"),
      min(num).as("minNum"),
      max(num).as("maxNum"))

    multiStats.join(valueStats, "attr").collect().map { r =>
      r.getAs[String]("attr") -> AttrStats(
        support     = r.getAs[Long]("support"),
        nMultiFacts = r.getAs[Long]("nMulti"),
        nDistinct   = r.getAs[Long]("nDistinct"),
        numericFrac = r.getAs[Double]("numericFrac"),
        linkFrac    = r.getAs[Double]("linkFrac"),
        spaceFrac   = r.getAs[Double]("spaceFrac"),
        minNum      = Option(r.getAs[java.lang.Double]("minNum")).map(_.doubleValue),
        maxNum      = Option(r.getAs[java.lang.Double]("maxNum")).map(_.doubleValue),
      )
    }.toMap
  }
}
