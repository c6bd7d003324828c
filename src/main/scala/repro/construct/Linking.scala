package repro.construct

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Dataflow, Ontology, Schema}

/** The Linking stage of knowledge construction (§2.3): in-source
  * deduplication and subject linking, implemented as record linkage over
  * the union of the incoming source payload and a KG view of relevant
  * entities:
  *
  *   1. extract a per-type KG view,
  *   2. combine with source entities into one payload,
  *   3. block,
  *   4. generate pairs and score them with a matching model,
  *   5. resolve with correlation clustering; each cluster keeps at most
  *      one KG entity, whose identifier all source entities in the
  *      cluster receive; clusters without a KG entity mint a new one.
  *
  * `same_as` facts recording source-entity → KG-entity links are emitted
  * for full provenance of the linking process.
  */
object Linking {

  /** Consolidate extended triples into entity records (id, etype, name,
    * aliases, attrs) for matching. Only simple facts participate in
    * matching features; composite nodes are fused later.
    */
  def toRecords(triples: DataFrame, isKg: Boolean): Dataset[Matching.Rec] = {
    val spark = triples.sparkSession
    import spark.implicits._
    triples
      .filter(col(Schema.RId).isNull)
      .groupBy(col(Schema.Subject).as("id"))
      .agg(collect_list(struct(col(Schema.Predicate).as("p"), col(Schema.Obj).as("o"))).as("po"))
      .as[(String, Seq[(String, String)])]
      .map { case (id, po) =>
        val byP = po.groupBy(_._1)
        def one(p: String) = byP.get(p).flatMap(_.map(_._2).sorted.headOption)
        val attrs = (byP -- Seq(Ontology.TypePred, Ontology.NamePred, Ontology.AliasPred, Ontology.SameAs))
          .map { case (p, vs) => p -> vs.map(_._2).sorted.head }
        Matching.Rec(
          id,
          one(Ontology.TypePred).getOrElse("unknown"),
          one(Ontology.NamePred).getOrElse(""),
          byP.getOrElse(Ontology.AliasPred, Seq.empty).map(_._2).distinct,
          attrs,
          isKg)
      }
  }

  /** Extract the KG view relevant to a source payload (§2.3 step 1): all
    * KG triples of entities whose type occurs in the payload.
    */
  def kgViewForTypes(kg: DataFrame, types: Seq[String]): DataFrame = {
    val subjects = kg
      .filter(col(Schema.Predicate) === Ontology.TypePred && col(Schema.Obj).isin(types: _*))
      .select(col(Schema.Subject))
      .distinct()
    kg.join(subjects, Seq(Schema.Subject), "left_semi")
  }

  final case class LinkResult(
      /** srcId → kgId for every incoming source entity. */
      links: DataFrame,
      /** same_as provenance triples (kgId, same_as, srcId). */
      sameAs: DataFrame,
  )

  /** Run linking of `sourceTriples` (source namespace) against
    * `kgViewTriples` (KG namespace).
    *
    * @param posThr  calibrated probability above which a pair is a
    *                high-confidence match (+1 edge)
    * @param negThr  probability below which it is a high-confidence
    *                non-match (−1 edge); the band in between adds no edge
    */
  def run(sourceTriples: DataFrame, kgViewTriples: DataFrame, model: Matching.Model,
          posThr: Double = 0.85, negThr: Double = 0.25,
          maxBlockSize: Int = 200, seed: Long = 42): LinkResult = {
    val spark = sourceTriples.sparkSession
    import spark.implicits._

    val srcRecs = toRecords(sourceTriples, isKg = false)
    val kgRecs  = toRecords(kgViewTriples, isKg = true)
    val all = srcRecs.union(kgRecs)
    val allDf = Dataflow.pin(all.toDF())

    // Blocking + pair generation over the combined payload. Pairs of two
    // existing KG entities are pruned up front: construction never merges
    // two KG entities (resolution keeps ≤1 per cluster), so scoring them
    // every batch would make delta consumption scale with |KG| instead of
    // |delta|.
    val srcIds = allDf.filter(!col("isKg")).select(col("id"))
    val allPairs = Blocking.candidatePairs(
      Blocking.blocks(allDf.select("id", "etype", "name", "aliases"), maxBlockSize))
    val pairs = allPairs
      .join(srcIds.withColumnRenamed("id", "id1"), Seq("id1"), "left_semi")
      .unionByName(allPairs.join(srcIds.withColumnRenamed("id", "id2"), Seq("id2"), "left_semi"))
      .dropDuplicates("id1", "id2")

    // Score pairs with the matching model.
    val r1 = allDf.select(col("id").as("id1"), struct(allDf.columns.map(col): _*).as("r1"))
    val r2 = allDf.select(col("id").as("id2"), struct(allDf.columns.map(col): _*).as("r2"))
    val m = model
    val scored = pairs.join(r1, Seq("id1")).join(r2, Seq("id2"))
      .select(col("r1").as("_1"), col("r2").as("_2"))
      .as[(Matching.Rec, Matching.Rec)]
      .map { case (a, b) =>
        val p = if (a.isKg && b.isKg) 0.0 else m.prob(a, b)
        (a.id, b.id, p)
      }
      .toDF("a", "b", "prob")

    val edges = scored
      .filter(col("prob") >= posThr || col("prob") <= negThr)
      .select(col("a"), col("b"),
              when(col("prob") >= posThr, 1).otherwise(-1).as("sign"),
              col("prob").as("score"))

    // Resolution only needs the *active* subgraph: incoming source
    // records plus KG records sharing a block with one of them. KG
    // entities untouched by the payload cannot change cluster — skipping
    // them is what makes delta consumption cheap as the KG grows (§2.4).
    val activeNodes = pairs.select(col("id1").as("id"))
      .union(pairs.select(col("id2").as("id")))
      .union(allDf.filter(!col("isKg")).select("id"))
      .distinct()
    val clusters = CorrelationClustering.cluster(activeNodes, edges, seed)

    // Resolution: pick the KG entity of each cluster (min id if several
    // slipped in), mint a new deterministic id otherwise.
    val info = clusters.join(allDf.select(col("id"), col("isKg")), Seq("id"))
    val clusterKg = info.filter(col("isKg"))
      .groupBy("cluster").agg(min("id").as("kgOfCluster"))
    val clusterNew = info.groupBy("cluster").agg(min("id").as("minId"))
    val mint = udf((s: String) => Schema.mintKgId(s))
    val resolved = clusterNew.join(clusterKg, Seq("cluster"), "left")
      .select(col("cluster"),
              coalesce(col("kgOfCluster"), mint(col("minId"))).as("kgId"))

    val links = Dataflow.pin(
      info.filter(!col("isKg"))
        .join(resolved, Seq("cluster"))
        .select(col("id").as("srcId"), col("kgId")))

    val sameAs = links.select(
      col("kgId").as(Schema.Subject),
      lit(Ontology.SameAs).as(Schema.Predicate),
      lit(null: String).as(Schema.RId), lit(null: String).as(Schema.RPredicate),
      col("srcId").as(Schema.Obj), lit("zxx").as(Schema.Locale),
      array(split(col("srcId"), ":").getItem(0)).as(Schema.Sources),
      array(lit(1.0)).as(Schema.Trust), lit(1.0).as(Schema.Conf))

    LinkResult(links, Schema.canonicalize(sameAs))
  }

  /** Rewrite the subjects of linked source triples into the KG namespace.
    * Every source subject must have a link (linking is total over the
    * payload); the inner join enforces it.
    */
  def rewriteSubjects(sourceTriples: DataFrame, links: DataFrame): DataFrame =
    Schema.canonicalize(
      sourceTriples
        .join(links.withColumnRenamed("srcId", Schema.Subject), Seq(Schema.Subject))
        .drop(Schema.Subject)
        .withColumnRenamed("kgId", Schema.Subject))
}
