package repro.construct

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthKG}
import repro.core.{Ontology, Schema}
import repro.exp.KgBuilders

/** End-to-end knowledge construction (§2.3–2.4): bootstrap + incremental
  * consumption of the synthetic source fleet, validated against the
  * ground-truth universe.
  */
class ConstructionSpec extends SparkSpec {

  private val scale = 12
  private lazy val u = SynthKG.universe(scale)
  private lazy val encoder = KgBuilders.encoderFor(u)
  private lazy val model = Matching.defaultModel(Some(encoder))
  private lazy val sources = SynthKG.sourceConfigs.take(3) // wiki, musicdb, moviedb

  private lazy val bootPayloads =
    sources.map(s => KgBuilders.payloadFor(spark, u, s, 0, None))
  private lazy val state0: Construction.KGState = {
    val (st, _) = Construction.consumeAll(
      Construction.KGState.empty(spark), bootPayloads, model, runTruthDiscovery = false)
    st
  }

  // Ground-truth mapping: for each source record id, the true entity.
  private lazy val truthOf: Map[String, String] =
    sources.flatMap(s => SynthKG.sourceRecords(u, s, 0)).map(r => r.id -> r.trueId).toMap

  private lazy val linkPairs: Map[String, String] = {
    import spark.implicits._
    state0.links.as[(String, String)].collect().toMap
  }

  test("bootstrap produces a non-empty KG") {
    assert(state0.factCount() > 0)
    assert(state0.entityCount() > 0)
  }

  test("every source entity received a link") {
    val srcIds = truthOf.keySet
    assert(srcIds.subsetOf(linkPairs.keySet))
  }

  test("all linked ids are in the KG namespace") {
    assert(linkPairs.values.forall(_.startsWith(Schema.KgNs)))
  }

  test("linking precision: records linked together mostly share a true entity") {
    // Group source records by assigned kg id; measure pairwise purity.
    // Distinct true entities can legitimately share a full name in the
    // synthetic universe (homonyms), so those merges are counted
    // separately — they are irreducible without extra evidence.
    val nameOf = (tid: String) => repro.ml.StringSim.normalize(u.byId(tid).name)
    val byKg = linkPairs.toSeq.groupBy(_._2).values.filter(_.size > 1)
    var same = 0L; var homonym = 0L; var total = 0L
    byKg.foreach { grp =>
      val trueIds = grp.map(g => truthOf(g._1))
      for (i <- trueIds.indices; j <- (i + 1) until trueIds.size) {
        total += 1
        if (trueIds(i) == trueIds(j)) same += 1
        else if (nameOf(trueIds(i)) == nameOf(trueIds(j))) homonym += 1
      }
    }
    if (total > 0) {
      assert(same.toDouble / total > 0.75, s"purity ${same.toDouble / total}")
      // non-homonym merge errors must be rare
      val hardErrors = total - same - homonym
      assert(hardErrors.toDouble / total < 0.1,
        s"hard merge errors $hardErrors of $total pairs")
    }
  }

  test("linking recall: most cross-source duplicates got the same kg id") {
    // true entities seen by >=2 source records
    val byTrue = truthOf.toSeq.groupBy(_._2).values.filter(_.size > 1)
    val (merged, total) = byTrue.foldLeft((0L, 0L)) { case ((m, t), grp) =>
      val kgIds = grp.map(g => linkPairs(g._1))
      val pairs = for {
        i <- kgIds.indices; j <- (i + 1) until kgIds.size
      } yield if (kgIds(i) == kgIds(j)) 1L else 0L
      (m + pairs.sum, t + pairs.size)
    }
    assert(total > 0)
    assert(merged.toDouble / total > 0.6, s"pairwise recall ${merged.toDouble / total}")
  }

  test("entity count is close to the number of distinct true entities covered") {
    val trueCovered = truthOf.values.toSet.size
    val entities = state0.entityCount()
    // over-splitting inflates, over-merging deflates; allow 25% slack
    assert(entities < trueCovered * 1.3, s"$entities vs $trueCovered")
    assert(entities > trueCovered * 0.7, s"$entities vs $trueCovered")
  }

  test("same_as facts provide full provenance of linking") {
    val sameAs = state0.stable.filter(col(Schema.Predicate) === Ontology.SameAs)
    val n = sameAs.count()
    assert(n >= truthOf.size, s"$n same_as facts for ${truthOf.size} source records")
  }

  test("fused facts carry merged multi-source provenance") {
    val multi = state0.stable
      .filter(size(col(Schema.Sources)) > 1)
      .count()
    assert(multi > 0, "expected facts corroborated by multiple sources")
  }

  test("provenance arrays stay aligned with trust arrays") {
    val bad = state0.stable
      .filter(size(col(Schema.Sources)) =!= size(col(Schema.Trust)))
      .count()
    assert(bad == 0)
  }

  test("volatile partition holds popularity facts in KG namespace") {
    val vol = state0.volatile
    assert(vol.count() > 0)
    assert(vol.filter(col(Schema.Predicate) =!= Ontology.Popularity).count() == 0)
    assert(vol.filter(!col(Schema.Subject).startsWith(Schema.KgNs)).count() == 0)
  }

  test("incremental consume of epoch-1 deltas updates the KG") {
    val deltas = sources.map(s => KgBuilders.payloadFor(spark, u, s, 1, Some((s, 0))))
    val (state1, stats) = Construction.consumeAll(state0, deltas, model, runTruthDiscovery = false)
    // epoch 1 adds entities (entry ramp) — facts and entities must not shrink dramatically
    assert(state1.factCount() >= state0.factCount())
    assert(stats.exists(s => s.linkedNew > 0 || s.reusedLinks > 0 || s.retractedSubjects >= 0))
    // updated entities reuse links instead of relinking
    val upd = stats.map(_.reusedLinks).sum
    assert(upd >= 0)
  }

  test("deleted entities lose this source's provenance") {
    import spark.implicits._
    // construct a synthetic deletion: remove one linked record's payload
    val someSrc = truthOf.keys.head
    val srcName = someSrc.split(':')(0)
    val delTriples = bootPayloads.find(_.source == srcName).get.added
      .filter(col(Schema.Subject) === someSrc)
    val payload = Construction.SourcePayload(srcName,
      added = Schema.emptyTriples(spark), deleted = delTriples,
      updated = Schema.emptyTriples(spark), volatileDump = Schema.emptyTriples(spark))
    val (state1, _) = Construction.consume(state0, payload, model, runTruthDiscovery = false)
    val kgId = linkPairs(someSrc)
    val remaining = state1.stable
      .filter(col(Schema.Subject) === kgId && array_contains(col(Schema.Sources), srcName))
      .count()
    assert(remaining == 0, s"facts of $kgId still cite $srcName")
    // link table no longer carries the deleted source id
    assert(state1.links.filter(col("srcId") === someSrc).count() == 0)
  }

  test("fullRebuild equals bootstrap construction on the same payloads") {
    val rebuilt = Construction.fullRebuild(spark, bootPayloads, model)
    assert(rebuilt.factCount() == state0.factCount())
    assert(rebuilt.entityCount() == state0.entityCount())
  }
}
