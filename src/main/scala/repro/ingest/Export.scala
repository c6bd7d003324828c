package repro.ingest

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._
import repro.core.{Ontology, Schema}

/** Export stage (§2.2): generate extended triples in the KG-ontology
  * schema for consumption by knowledge construction. The one-hop
  * triplication of composite relationship nodes happens here, so the
  * construction pipeline never self-joins ingested data (§2.4,
  * "Lightweight Ingestion").
  */
object Export {

  private def finish(df: DataFrame): DataFrame =
    Schema.canonicalize(
      df.withColumn(Schema.Locale, coalesce(col(Schema.Locale), lit("en")))
        .filter(col(Schema.Obj).isNotNull && trim(col(Schema.Obj)) =!= ""))

  /** Entity-centric rows (the `SynthKG.recordsToRows` contract: id, source,
    * trust, etype, name, attrs, refNames, compositePred, composites,
    * volatile) → *stable* extended triples in the source namespace.
    */
  def stableTriples(rows: DataFrame): DataFrame = {
    val simple = rows.select(
      col("id").as(Schema.Subject),
      explode(map_concat(
        map(lit(Ontology.TypePred), col("etype")),
        map(lit(Ontology.NamePred), col("name")),
        coalesce(col("attrs"), map()),
        coalesce(col("refNames"), map()),
      )).as(Seq("predicate", "obj")),
      col("source"), col("trust"),
    ).select(
      col(Schema.Subject), col(Schema.Predicate),
      lit(null: String).as(Schema.RId), lit(null: String).as(Schema.RPredicate),
      col(Schema.Obj), lit("en").as(Schema.Locale),
      array(col("source")).as(Schema.Sources), array(col("trust")).as(Schema.Trust),
      col("trust").as(Schema.Conf),
    )

    val composite = rows
      .filter(col("compositePred").isNotNull && size(coalesce(col("composites"), array())) > 0)
      .select(col("id"), col("source"), col("trust"), col("compositePred"),
              posexplode(col("composites")).as(Seq("pos", "rmap")))
      .select(col("id"), col("source"), col("trust"), col("compositePred"),
              concat(col("id"), lit("#r"), col("pos")).as(Schema.RId),
              explode(col("rmap")).as(Seq(Schema.RPredicate, Schema.Obj)))
      .select(
        col("id").as(Schema.Subject), col("compositePred").as(Schema.Predicate),
        col(Schema.RId), col(Schema.RPredicate), col(Schema.Obj),
        lit("en").as(Schema.Locale),
        array(col("source")).as(Schema.Sources), array(col("trust")).as(Schema.Trust),
        col("trust").as(Schema.Conf),
      )

    finish(simple.unionByName(composite))
  }

  /** Volatile predicates of the same rows as a *separate* full dump
    * (§2.4) — fused later by partition overwrite, never by join.
    */
  def volatileTriples(rows: DataFrame): DataFrame =
    finish(rows
      .filter(size(map_keys(coalesce(col("volatile"), map()))) > 0)
      .select(col("id"), col("source"), col("trust"),
              explode(col("volatile")).as(Seq("predicate", "obj")))
      .select(
        col("id").as(Schema.Subject), col(Schema.Predicate),
        lit(null: String).as(Schema.RId), lit(null: String).as(Schema.RPredicate),
        col(Schema.Obj), lit("en").as(Schema.Locale),
        array(col("source")).as(Schema.Sources), array(col("trust")).as(Schema.Trust),
        col("trust").as(Schema.Conf)))

  /** Wide (one column per predicate) aligned rows — the output of
    * [[Alignment.align]] — melted into extended triples. Used by custom
    * ingestion pipelines built from raw artifacts.
    *
    * @param volatilePreds predicate columns routed to the volatile dump
    */
  def fromWide(aligned: DataFrame, sourceName: String, trust: Double,
               volatilePreds: Set[String] = Set.empty): (DataFrame, DataFrame) = {
    val predCols = aligned.columns.filterNot(c => c == "id" || c == "etype")
    def melt(preds: Seq[String]): DataFrame = if (preds.isEmpty) {
      Schema.emptyTriples(aligned.sparkSession)
    } else {
      val pairs: Seq[Column] = preds.map(p =>
        struct(lit(p).as("predicate"), col(p).cast("string").as("obj")))
      finish(aligned.select(
        col("id").as(Schema.Subject),
        explode(array(pairs: _*)).as("pv"),
        col("etype"))
        .select(
          col(Schema.Subject), col("pv.predicate").as(Schema.Predicate),
          lit(null: String).as(Schema.RId), lit(null: String).as(Schema.RPredicate),
          col("pv.obj").as(Schema.Obj), lit("en").as(Schema.Locale),
          array(lit(sourceName)).as(Schema.Sources), array(lit(trust)).as(Schema.Trust),
          lit(trust).as(Schema.Conf)))
    }
    val stablePreds = predCols.filterNot(volatilePreds.contains).toSeq
    val typeTriples = finish(aligned.select(
      col("id").as(Schema.Subject), lit(Ontology.TypePred).as(Schema.Predicate),
      lit(null: String).as(Schema.RId), lit(null: String).as(Schema.RPredicate),
      col("etype").as(Schema.Obj), lit("en").as(Schema.Locale),
      array(lit(sourceName)).as(Schema.Sources), array(lit(trust)).as(Schema.Trust),
      lit(trust).as(Schema.Conf)))
    val stable = melt(stablePreds).unionByName(typeTriples)
    val volat = if (volatilePreds.isEmpty) stable.limit(0)
                else melt(predCols.filter(volatilePreds.contains).toSeq)
    (stable, volat)
  }
}
