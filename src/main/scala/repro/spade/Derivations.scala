package repro.spade

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.rdf.Triples

/** Derived Property Enumeration (paper §3, offline processing).
  *
  * Four derivation strategies enrich the attribute pool of a CFS:
  *  - `count(p)` — number of values of a multi-valued property `p`;
  *  - `kw(p)`   — keywords occurring in the values of a text property;
  *  - `lang(p)` — the language of a text property (en/fr heuristic);
  *  - `p/q`     — length-1 paths through a link property `p` to a property
  *                `q` of the target nodes (the most numerous kind, per the
  *                paper's Table 2).
  *
  * Each strategy emits rows in the attribute-bag layout `(attr, fact,
  * value)` plus the metadata (kind, base property) used by the enumeration
  * rules ("no attribute may appear together with one derived from it").
  */
object Derivations {

  private val frWords = Seq("le", "la", "les", "de", "des", "du", "et", "un", "une",
    "avec", "pour", "sur", "est", "roti", "poulet", "ail", "frais", "salade",
    "soupe", "creme", "gratin", "mondial", "marche", "croissance", "entreprise")
  private val enWords = Seq("the", "a", "an", "of", "and", "with", "for", "on",
    "is", "in", "to", "this", "that", "company", "global", "leader", "market",
    "growth", "production", "oversees", "roasted", "chicken", "fresh", "baked")

  /** Metadata of one derived attribute. */
  final case class DerivedAttr(name: String, kind: AttrKind, baseProp: String)

  private def tokens(valueCol: org.apache.spark.sql.Column) =
    filter(split(lower(valueCol), "[^a-z]+"), w => length(w) >= 3)

  /** `count(p)` rows for every multi-valued direct property. */
  def countDerivations(bag: DataFrame, stats: Map[String, AttrStats])
      : (Option[DataFrame], Seq[DerivedAttr]) = {
    val multi = stats.filter(_._2.isMultiValued).keys.toSeq.sorted
    if (multi.isEmpty) return (None, Nil)
    val rows = bag.filter(col("attr").isin(multi: _*))
      .groupBy("attr", "fact").agg(count("value").as("cnt"))
      .select(concat(lit("count("), col("attr"), lit(")")).as("attr"),
              col("fact"), col("cnt").cast("string").as("value"))
    (Some(rows), multi.map(p => DerivedAttr(s"count($p)", AttrKind.CountOf, p)))
  }

  /** `kw(p)` rows: one value per distinct keyword of each fact's text. */
  def keywordDerivations(bag: DataFrame, stats: Map[String, AttrStats])
      : (Option[DataFrame], Seq[DerivedAttr]) = {
    val text = stats.filter(_._2.isText).keys.toSeq.sorted
    if (text.isEmpty) return (None, Nil)
    val rows = bag.filter(col("attr").isin(text: _*))
      .select(concat(lit("kw("), col("attr"), lit(")")).as("attr"),
              col("fact"),
              explode(array_distinct(filter(tokens(col("value")), w => length(w) >= 4)))
                .as("value"))
    (Some(rows), text.map(p => DerivedAttr(s"kw($p)", AttrKind.Keyword, p)))
  }

  /** `lang(p)` rows: crude stopword-vote language detector (en vs fr). */
  def langDerivations(bag: DataFrame, stats: Map[String, AttrStats])
      : (Option[DataFrame], Seq[DerivedAttr]) = {
    val text = stats.filter(_._2.isText).keys.toSeq.sorted
    if (text.isEmpty) return (None, Nil)
    val fr = array(frWords.map(lit): _*)
    val en = array(enWords.map(lit): _*)
    val rows = bag.filter(col("attr").isin(text: _*))
      .select(concat(lit("lang("), col("attr"), lit(")")).as("attr"),
              col("fact"),
              when(size(array_intersect(tokens(col("value")), fr)) >
                   size(array_intersect(tokens(col("value")), en)), "French")
                .otherwise("English").as("value"))
      .groupBy("attr", "fact").agg(first("value").as("value"))
    (Some(rows), text.map(p => DerivedAttr(s"lang($p)", AttrKind.Lang, p)))
  }

  /** `p/q` rows for every link property `p` and the (at most
    * `maxPathsPerProp`, by support) properties `q` of its targets.
    */
  def pathDerivations(triples: DataFrame, bag: DataFrame, stats: Map[String, AttrStats],
                      maxPathsPerProp: Int): (Option[DataFrame], Seq[DerivedAttr]) = {
    val links = stats.filter(_._2.isLink).keys.toSeq.sorted
    if (links.isEmpty) return (None, Nil)
    val hop = triples.filter(col("p") =!= Triples.TypeProperty)
      .select(col("s").as("value"), col("p").as("q"), col("o").as("pathValue"))
    val parts = links.flatMap { p =>
      val joined = Attributes.table(bag, p).join(hop, "value")
      val topQ = joined.groupBy("q").agg(countDistinct("fact").as("n"))
        .orderBy(col("n").desc, col("q"))
        .limit(maxPathsPerProp).collect().map(_.getString(0)).toSeq
      if (topQ.isEmpty) None
      else Some((
        joined.filter(col("q").isin(topQ: _*))
          .select(concat(lit(p), lit("/"), col("q")).as("attr"),
                  col("fact"), col("pathValue").as("value"))
          .distinct(),
        topQ.map(q => DerivedAttr(s"$p/$q", AttrKind.Path, p))))
    }
    if (parts.isEmpty) (None, Nil)
    else (Some(parts.map(_._1).reduce(_.unionByName(_))), parts.flatMap(_._2))
  }

  /** Run all four strategies; returns the derived part of the bag plus the
    * metadata for every derived attribute.
    */
  def deriveAll(triples: DataFrame, bag: DataFrame, stats: Map[String, AttrStats],
                cfg: SpadeConfig): (Option[DataFrame], Seq[DerivedAttr]) = {
    val (cRows, cMeta) = countDerivations(bag, stats)
    val (kRows, kMeta) = keywordDerivations(bag, stats)
    val (lRows, lMeta) = langDerivations(bag, stats)
    val (pRows, pMeta) = pathDerivations(triples, bag, stats, cfg.maxPathsPerProp)
    val frames = Seq(cRows, kRows, lRows, pRows).flatten
    val union = if (frames.isEmpty) None else Some(frames.reduce(_.unionByName(_)))
    (union, cMeta ++ kMeta ++ lMeta ++ pMeta)
  }
}
