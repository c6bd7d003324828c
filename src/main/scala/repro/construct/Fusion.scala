package repro.construct

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.{Ontology, Schema}

/** Fusion (§2.3): merge a linked source payload with the KG into a new
  * consistent state.
  *
  *   - Simple facts fuse by outer join on the fact key: an existing fact
  *     gains the source in its provenance, a new fact is added.
  *   - Composite facts first match source relationship nodes against KG
  *     relationship nodes by the intersection of their underlying facts;
  *     sufficiently-overlapping nodes merge (the source node adopts the KG
  *     `r_id`), the rest are added as new relationship nodes.
  *   - Truth discovery estimates a probability of correctness per fact
  *     from cross-source (dis)agreement and source reliability, stored in
  *     the `conf` metadata column.
  *   - Volatile predicates fuse by per-source partition overwrite, never
  *     by join (§2.4).
  *
  * Fusion is non-destructive: provenance arrays always record every
  * contributing source, enabling license views and on-demand deletion.
  */
object Fusion {

  private val keyCols: Seq[String] = Schema.factKey

  /** Merge duplicate fact rows (identical fact key) into one row whose
    * provenance is the union of contributors (max trust per source) and
    * whose confidence is the noisy-or of contributor trusts. Union + this
    * is exactly the outer-join fusion of §2.3 for simple facts.
    */
  def consolidate(triples: DataFrame): DataFrame = {
    val exploded = triples
      .select(keyCols.map(col) :+
              explode(arrays_zip(col(Schema.Sources), col(Schema.Trust))).as("st"): _*)
      .select(keyCols.map(col) :+ col("st.sources").as("src") :+ col("st.trust").as("t"): _*)
    val bySrc = exploded.groupBy((keyCols :+ "src").map(col): _*).agg(max("t").as("t"))
    bySrc
      .groupBy(keyCols.map(col): _*)
      .agg(sort_array(collect_list(struct(col("src"), col("t")))).as("st"))
      .select(keyCols.map(col) :+
              expr("st.src").as(Schema.Sources) :+
              expr("st.t").as(Schema.Trust) :+
              expr("round(1.0 - aggregate(st, CAST(1.0 AS DOUBLE), (acc, x) -> acc * (1.0 - x.t)), 6)")
                .as(Schema.Conf): _*)
  }

  /** Deterministic relationship-node id for a source node that matched no
    * KG node: a hash of the owning subject and the node's fact set, so
    * duplicate source records of the same entity mint the *same* new node.
    */
  private val mintRId = udf((subject: String, facts: Seq[String]) =>
    subject + "#r:" + Schema.mintKgId(subject + "|" + facts.sorted.mkString("§")).drop(3).take(8))

  /** Match source relationship nodes to KG relationship nodes of the same
    * (subject, predicate): a pair merges when the intersection of their
    * (r_predicate, obj) fact sets is "sufficient" — at least 2 shared
    * facts, or every fact of the smaller node is shared. Returns the
    * source composite rows with their `r_id` rewritten (to the matched KG
    * node, or to a minted deterministic id).
    */
  def alignRelationshipNodes(kgComposite: DataFrame, srcComposite: DataFrame): DataFrame = {
    def nodes(df: DataFrame, ridAs: String, factsAs: String): DataFrame =
      df.groupBy(col(Schema.Subject), col(Schema.Predicate), col(Schema.RId).as(ridAs))
        .agg(collect_set(concat_ws("=", col(Schema.RPredicate), col(Schema.Obj))).as(factsAs))

    val src = nodes(srcComposite, "srcRId", "srcFacts")
    val kg  = nodes(kgComposite,  "kgRId",  "kgFacts")

    val cand = src.join(kg, Seq(Schema.Subject, Schema.Predicate), "left")
      .withColumn("inter", when(col("kgRId").isNull, lit(0))
        .otherwise(size(array_intersect(col("srcFacts"), col("kgFacts")))))
      .withColumn("minSize", when(col("kgRId").isNull, lit(0))
        .otherwise(least(size(col("srcFacts")), size(col("kgFacts")))))
      .withColumn("ok", col("inter") >= least(lit(2), col("minSize")) && col("inter") >= 1)

    val best = cand
      .withColumn("rk", row_number().over(
        Window.partitionBy(Schema.Subject, Schema.Predicate, "srcRId")
          .orderBy(col("ok").desc, col("inter").desc, col("kgRId").asc_nulls_last)))
      .filter(col("rk") === 1)
      .select(col(Schema.Subject), col(Schema.Predicate), col("srcRId"), col("srcFacts"),
              when(col("ok"), col("kgRId")).as("matchedRId"))

    srcComposite
      .join(best.withColumnRenamed("srcRId", Schema.RId),
            Seq(Schema.Subject, Schema.Predicate, Schema.RId))
      .withColumn("__newRId",
        coalesce(col("matchedRId"), mintRId(col(Schema.Subject), col("srcFacts"))))
      .drop(Schema.RId, "matchedRId", "srcFacts")
      .withColumnRenamed("__newRId", Schema.RId)
      .select(Schema.columns.map(col): _*)
  }

  /** Fuse a linked, object-resolved source payload into the KG (stable
    * facts only). The sync point of the parallel construction pipeline.
    */
  def fuse(kg: DataFrame, incoming: DataFrame): DataFrame = {
    val kgSimple   = kg.filter(col(Schema.RId).isNull)
    val kgComp     = kg.filter(col(Schema.RId).isNotNull)
    val inSimple   = incoming.filter(col(Schema.RId).isNull)
    val inComp     = incoming.filter(col(Schema.RId).isNotNull)

    val fusedSimple = consolidate(kgSimple.unionByName(inSimple))
    val alignedComp = alignRelationshipNodes(kgComp, inComp)
    val fusedComp   = consolidate(kgComp.unionByName(alignedComp))
    Schema.canonicalize(fusedSimple.unionByName(fusedComp))
  }

  /** Remove `source` from the provenance of all facts of the given KG
    * subjects (used for Updated — retract-then-refuse — and Deleted
    * payloads). Facts left with no remaining provenance are dropped; the
    * non-destructive contract is honoured because deletion is driven by
    * the provenance arrays themselves (on-demand data deletion, §1.2).
    */
  def retractSource(kg: DataFrame, source: String, subjects: DataFrame): DataFrame = {
    val marked = kg.join(subjects.select(col("subject").as(Schema.Subject)).distinct()
                           .withColumn("__hit", lit(true)),
                         Seq(Schema.Subject), "left")
    val zipped = arrays_zip(col(Schema.Sources), col(Schema.Trust))
    val kept = expr(s"filter(arrays_zip(${Schema.Sources}, ${Schema.Trust}), x -> x.sources != '$source')")
    Schema.canonicalize(
      marked
        .withColumn("__kept", when(col("__hit").isNotNull, kept).otherwise(zipped))
        .filter(size(col("__kept")) > 0)
        .withColumn(Schema.Sources, expr("__kept.sources"))
        .withColumn(Schema.Trust, expr("__kept.trust"))
        .withColumn(Schema.Conf,
          expr(s"round(1.0 - aggregate(__kept, CAST(1.0 AS DOUBLE), (acc, x) -> acc * (1.0 - x.trust)), 6)"))
        .drop("__hit", "__kept"))
  }

  /** Volatile fusion (§2.4): the KG maintains a per-source partition of
    * volatile triples; consuming a new volatile dump *overwrites* that
    * source's partition — no joins. `dump` must already be in the KG
    * namespace (subjects rewritten through the link table).
    */
  def overwriteVolatilePartition(kgVolatile: DataFrame, source: String, dump: DataFrame): DataFrame =
    Schema.canonicalize(
      kgVolatile.filter(!array_contains(col(Schema.Sources), source)).unionByName(dump))

  /** Truth discovery over the fused KG (§2.3): iterate (a) fact confidence
    * from reliability-weighted source votes, (b) source reliability from
    * the confidence of the facts it supports. Conflicts are competing
    * objects for the same single-valued slot (same subject, predicate,
    * relationship slot, locale). Multi-valued predicates (alias, same_as)
    * keep their noisy-or confidence.
    */
  def truthDiscovery(kg: DataFrame, iterations: Int = 2,
                     multiValued: Set[String] = Set(Ontology.AliasPred, Ontology.SameAs)): DataFrame = {
    val spark = kg.sparkSession
    val td = kg.filter(!col(Schema.Predicate).isin(multiValued.toSeq: _*))
    val keep = kg.filter(col(Schema.Predicate).isin(multiValued.toSeq: _*))

    // Initial reliability: the mean declared trust of each source.
    var reliability: Map[String, Double] = td
      .select(explode(arrays_zip(col(Schema.Sources), col(Schema.Trust))).as("st"))
      .groupBy(col("st.sources").as("src")).agg(avg("st.trust").as("r"))
      .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap

    val slot = Seq(Schema.Subject, Schema.Predicate, Schema.RId, Schema.RPredicate, Schema.Locale)
    var cur = td
    for (_ <- 0 until math.max(1, iterations)) {
      val rel = reliability
      val wUdf = udf((srcs: Seq[String]) => srcs.map(rel.getOrElse(_, 0.5)).sum)
      val noisyOr = udf((srcs: Seq[String], ts: Seq[Double]) =>
        1.0 - srcs.zip(ts).map { case (s, t) => 1.0 - t * rel.getOrElse(s, 0.5) }.product)
      val win = Window.partitionBy(slot.map(col): _*)
      val scoredNow = td
        .withColumn("__w", wUdf(col(Schema.Sources)))
        .withColumn("__total", sum("__w").over(win))
        .withColumn("__nvals", size(collect_set(col(Schema.Obj)).over(win)))
        .withColumn(Schema.Conf,
          round(when(col("__nvals") > 1, col("__w") / col("__total"))
            .otherwise(noisyOr(col(Schema.Sources), col(Schema.Trust))), 6))
        .drop("__w", "__total", "__nvals")
      cur = scoredNow
      reliability = scoredNow
        .select(col(Schema.Conf), explode(col(Schema.Sources)).as("src"))
        .groupBy("src").agg(avg(Schema.Conf).as("r"))
        .collect().map(r => r.getString(0) -> r.getDouble(1)).toMap
    }
    Schema.canonicalize(cur.unionByName(keep))
  }
}
