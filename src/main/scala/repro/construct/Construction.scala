package repro.construct

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.core.{Dataflow, Ontology, Schema}

/** The continuously-running, delta-based knowledge construction framework
  * (§2.4, Figure 5). It always consumes source diffs:
  *
  *   - ToAdd: fully linked (all linking stages) then fused,
  *   - ToUpdate: previously linked — links are *looked up*, the source's
  *     old contribution is retracted and the new payload fused,
  *   - ToDelete: links looked up, provenance retracted, links dropped,
  *   - volatile dump: fused last by per-source partition overwrite.
  *
  * The three payloads of a source are prepared in parallel (independent
  * DataFrame dataflows); fusion is the per-source synchronization point.
  * A brand-new source is a full Added payload (see `Delta.bootstrap`).
  */
object Construction {

  /** The KG between construction runs: stable triples, volatile triples
    * (partitioned by source via their provenance), and the link table
    * (source entity id → KG entity id) that makes construction
    * incremental.
    */
  final case class KGState(stable: DataFrame, volatile: DataFrame, links: DataFrame) {

    /** The served graph: stable and volatile facts together. */
    def full: DataFrame = stable.unionByName(volatile)

    /** Cut lineage so state does not accumulate plans across batches. */
    def materialized: KGState =
      KGState(Dataflow.pin(stable), Dataflow.pin(volatile), Dataflow.pin(links))

    def entityCount(): Long =
      stable.select(Schema.Subject).distinct().count()

    def factCount(): Long = stable.count()
  }

  object KGState {
    def empty(spark: SparkSession): KGState = {
      import spark.implicits._
      KGState(Schema.emptyTriples(spark), Schema.emptyTriples(spark),
              Seq.empty[(String, String)].toDF("srcId", "kgId"))
    }
  }

  /** One source's prepared payload, as produced by the ingestion platform:
    * extended triples in the source namespace, pre-partitioned.
    */
  final case class SourcePayload(
      source: String,
      added: DataFrame,
      deleted: DataFrame,
      updated: DataFrame,
      volatileDump: DataFrame,
  )

  final case class Stats(source: String, linkedNew: Long, reusedLinks: Long,
                         retractedSubjects: Long, fusedFacts: Long)

  /** Consume one source payload into the KG. `obr` is the object
    * resolution hook (see [[ObjectResolutionStep]]); identity when absent.
    */
  def consume(state: KGState, payload: SourcePayload,
              model: Matching.Model,
              obr: DataFrame => DataFrame = identity,
              runTruthDiscovery: Boolean = true,
              posThr: Double = 0.85, negThr: Double = 0.25): (KGState, Stats) = {
    val spark = state.stable.sparkSession
    import spark.implicits._

    // ------------------------------------------------------------- ToAdd
    // Fully linked: extract the per-type KG view, link, rewrite, resolve.
    val addTypes = payload.added
      .filter(col(Schema.Predicate) === Ontology.TypePred)
      .select(Schema.Obj).distinct().as[String].collect().toSeq
    val (addPayload, newLinks, sameAs) =
      if (addTypes.isEmpty) (Schema.emptyTriples(spark), Seq.empty[(String, String)].toDF("srcId", "kgId"), Schema.emptyTriples(spark))
      else {
        val kgView = Linking.kgViewForTypes(state.stable, addTypes)
        val res = Linking.run(payload.added, kgView, model, posThr, negThr)
        (obr(Linking.rewriteSubjects(payload.added, res.links)), res.links, res.sameAs)
      }

    // ---------------------------------------------------------- ToUpdate
    // Previously linked: look up links in the current KG (§2.4) — no
    // blocking/matching. Entities with no prior link (out-of-order feeds)
    // are routed through the Added path on the next batch; here they are
    // dropped from the update set to keep the lookup contract explicit.
    val updSubjects = payload.updated.select(col(Schema.Subject).as("srcId")).distinct()
    val updLinks = updSubjects.join(state.links, Seq("srcId"))
    val updPayload = obr(Linking.rewriteSubjects(payload.updated, updLinks))
    val updKgSubjects = updLinks.select(col("kgId").as("subject")).distinct()

    // ---------------------------------------------------------- ToDelete
    val delSubjects = payload.deleted.select(col(Schema.Subject).as("srcId")).distinct()
    val delLinks = delSubjects.join(state.links, Seq("srcId"))
    val delKgSubjects = delLinks.select(col("kgId").as("subject")).distinct()

    // ------------------------------------------------- fusion sync point
    // Retract this source's prior contribution for updated+deleted
    // subjects, then fuse the new payloads and the same_as provenance.
    // Materialize the three payload dataflows at the sync point so the
    // fusion plan is shallow (deep composite plans degrade Catalyst's
    // size-estimation into unbounded BigInteger arithmetic).
    val addReady = Dataflow.pin(addPayload.unionByName(sameAs))
    val updReady = Dataflow.pin(updPayload)
    val retracted = Dataflow.pin(Fusion.retractSource(
      state.stable, payload.source, updKgSubjects.union(delKgSubjects)))
    val fusedOnce = Dataflow.pin(Fusion.fuse(retracted, addReady))
    val fusedTwice = Fusion.fuse(fusedOnce, updReady)
    val newStable0 =
      if (runTruthDiscovery) Fusion.truthDiscovery(fusedTwice) else fusedTwice

    // ------------------------------------------------------ link table
    val keptLinks = state.links.join(delSubjects, Seq("srcId"), "left_anti")
    val allLinks = keptLinks.unionByName(newLinks).dropDuplicates("srcId")

    // -------------------------------------------------------- volatile
    // Map the dump into the KG namespace through the *new* link table,
    // then overwrite this source's volatile partition (optimized path —
    // no join against KG triples).
    val dumpLinked = payload.volatileDump
      .join(allLinks.withColumnRenamed("srcId", Schema.Subject), Seq(Schema.Subject))
      .drop(Schema.Subject).withColumnRenamed("kgId", Schema.Subject)
    val newVolatile = Fusion.overwriteVolatilePartition(
      state.volatile, payload.source, Schema.canonicalize(dumpLinked))

    val next = KGState(newStable0, newVolatile, allLinks).materialized
    val stats = Stats(payload.source,
      linkedNew = newLinks.count(), reusedLinks = updLinks.count(),
      retractedSubjects = updKgSubjects.union(delKgSubjects).distinct().count(),
      fusedFacts = addPayload.count() + updPayload.count())
    (next, stats)
  }

  /** Consume several sources. Linking of different sources is an
    * independent dataflow (inter-source parallelism); fusion consumes the
    * payloads one at a time — the synchronization discipline of Figure 5.
    */
  def consumeAll(state: KGState, payloads: Seq[SourcePayload], model: Matching.Model,
                 obr: DataFrame => DataFrame = identity,
                 runTruthDiscovery: Boolean = true): (KGState, Seq[Stats]) =
    payloads.foldLeft((state, Seq.empty[Stats])) { case ((st, acc), p) =>
      val (n, s) = consume(st, p, model, obr, runTruthDiscovery)
      (n, acc :+ s)
    }

  /** Full (non-incremental) construction of the same payloads — the
    * baseline for E8: every batch re-links everything from scratch.
    */
  def fullRebuild(spark: SparkSession, payloads: Seq[SourcePayload],
                  model: Matching.Model,
                  obr: DataFrame => DataFrame = identity): KGState = {
    val bootstrapped = payloads.map(p => p.copy(
      added = p.added.unionByName(p.updated),
      deleted = Schema.emptyTriples(spark), updated = Schema.emptyTriples(spark)))
    consumeAll(KGState.empty(spark), bootstrapped, model, obr)._1
  }
}
