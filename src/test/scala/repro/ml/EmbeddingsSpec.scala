package repro.ml

import repro.{SparkSpec, SynthKG}
import repro.core.Schema
import repro.exp.KgBuilders
import Embeddings._

/** KG embeddings: TransE/DistMult training and the three unified tasks
  * (§5.3): fact ranking, fact verification, missing-fact imputation.
  */
class EmbeddingsSpec extends SparkSpec {

  private lazy val u = SynthKG.universe(6)
  private lazy val kg = repro.core.Dataflow.pin(KgBuilders.directKG(spark, u))
  private lazy val edges = relationEdges(kg)
  private lazy val transe = train(edges, TransE, Config(epochs = 25))

  test("relationEdges keeps only entity-to-entity facts") {
    assert(edges.nonEmpty)
    assert(edges.forall(t => t.s.startsWith(Schema.KgNs) && t.o.startsWith(Schema.KgNs)))
  }

  test("relationEdges excludes same_as metadata facts") {
    assert(edges.forall(_.p != "same_as"))
  }

  test("relationEdges flattens composite predicates") {
    assert(edges.exists(_.p == "educated_at.school"))
  }

  test("training is deterministic in the seed") {
    val a = train(edges.take(200), TransE, Config(epochs = 5, seed = 3))
    val b = train(edges.take(200), TransE, Config(epochs = 5, seed = 3))
    val ent = a.entity.keys.head
    assert(a.entity(ent).toSeq == b.entity(ent).toSeq)
  }

  test("training rejects empty edge sets") {
    intercept[IllegalArgumentException] { train(Seq.empty, TransE) }
  }

  test("TransE scores true facts above random corruptions on average") {
    val rnd = new scala.util.Random(1)
    val ents = transe.entity.keys.toArray
    val trials = edges.take(300).map { t =>
      val fake = ents(rnd.nextInt(ents.length))
      if (transe.score(t) > transe.score(Triple(t.s, t.p, fake))) 1 else 0
    }
    val acc = trials.sum.toDouble / trials.size
    assert(acc > 0.7, s"accuracy $acc")
  }

  test("DistMult also separates true from corrupted facts") {
    val dm = train(edges, DistMult, Config(epochs = 25))
    val rnd = new scala.util.Random(2)
    val ents = dm.entity.keys.toArray
    val trials = edges.take(300).map { t =>
      val fake = ents(rnd.nextInt(ents.length))
      if (dm.score(t) > dm.score(Triple(t.s, t.p, fake))) 1 else 0
    }
    assert(trials.sum.toDouble / trials.size > 0.65)
  }

  test("score of an unknown entity is -inf (no silent garbage)") {
    assert(transe.score("kg:ghost", edges.head.p, edges.head.o).isNegInfinity)
  }

  test("fact ranking orders a true object above corrupted ones") {
    val t = edges.head
    val rnd = new scala.util.Random(3)
    val ents = transe.entity.keys.toArray
    val distractors = (1 to 5).map(_ => ents(rnd.nextInt(ents.length))).filterNot(_ == t.o)
    val ranked = rankFacts(transe, t.s, t.p, t.o +: distractors)
    assert(ranked.take(3).map(_._1).contains(t.o))
  }

  test("fact verification flags the lowest-scoring quantile per predicate") {
    val facts = edges.take(100)
    val flagged = verifyFacts(transe, facts, quantile = 0.1)
    assert(flagged.count(_._3) >= facts.groupBy(_.p).size) // at least one per predicate
    assert(flagged.size == facts.size)
  }

  test("imputation finds the held-out object in the top-k via the Vector DB") {
    val types = u.entities.map(e => KgBuilders.kgIdOf(e.id) -> e.etype).toMap
    val vdb = loadVectorDB(transe, types)
    val sample = edges.take(60)
    val hits = sample.count { t =>
      impute(transe, vdb, t.s, t.p, k = 10, typeFilter = types.get(t.o))
        .exists(_._1 == t.o)
    }
    assert(hits.toDouble / sample.size > 0.3, s"hit@10 ${hits.toDouble / sample.size}")
  }

  test("the Vector DB attribute filter restricts imputation candidates") {
    val types = u.entities.map(e => KgBuilders.kgIdOf(e.id) -> e.etype).toMap
    val vdb = loadVectorDB(transe, types)
    val t = edges.find(_.p == "birthplace").get
    val out = impute(transe, vdb, t.s, t.p, k = 5, typeFilter = Some("city"))
    assert(out.forall { case (id, _) => types.get(id).contains("city") })
  }

  test("queryVector composes per model kind") {
    val t = edges.head
    val qT = transe.queryVector(t.s, t.p).get
    assert(qT.length == 32)
    val dm = train(edges.take(100), DistMult, Config(epochs = 3))
    val t2 = dm.entity.keys.head
    val p2 = dm.relation.keys.head
    assert(dm.queryVector(t2, p2).get.length == 32)
  }
}
