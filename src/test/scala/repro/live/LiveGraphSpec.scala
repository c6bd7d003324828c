package repro.live

import repro.{SparkSpec, SynthKG}
import repro.engine.Importance
import repro.exp.KgBuilders
import repro.ml.Nerd

/** The live KG (§4): stable view + streaming sources + curation. */
class LiveGraphSpec extends SparkSpec {

  private lazy val u = SynthKG.universe(6)
  private lazy val kg = repro.core.Dataflow.pin(KgBuilders.directKG(spark, u))
  private lazy val er = new Nerd.Index(
    Nerd.buildEntries(kg, Importance.importanceView(kg, prIterations = 3)),
    KgBuilders.encoderFor(u))

  private def freshLive(): LiveGraph = {
    val live = new LiveGraph()
    live.loadStable(LiveGraph.stableView(kg))
    live
  }

  test("stableView produces one record per entity with flattened predicates") {
    val view = LiveGraph.stableView(kg)
    assert(view.size == u.entities.size)
    val (_, rec) = view.find(_._1 == KgBuilders.kgIdOf(u.byType("person").head.id)).get
    assert(rec.contains("name"))
    assert(rec.keys.exists(_.startsWith("educated_at.")))
  }

  test("loadStable makes entities queryable through the KV store and index") {
    val live = freshLive()
    val p = u.byType("person").head
    val ids = live.index.lookup(p.name, Some("name"))
    assert(ids.contains(KgBuilders.kgIdOf(p.id)))
    assert(live.kv.get(KgBuilders.kgIdOf(p.id)).isDefined)
  }

  test("resolveEvent links textual team references to stable entity ids (§4.1)") {
    val ev = SynthKG.liveEvents(u, 5).head
    val (id, rec) = LiveGraph.resolveEvent(ev, er)
    assert(id == s"live:${ev.eventId}")
    val home = rec("home_team").head
    assert(home.startsWith("kg:"), s"unresolved: $home")
  }

  test("resolved events reference the correct team") {
    val ev = SynthKG.liveEvents(u, 8).find(e => e.awayRef == e.awayRef).get
    val (_, rec) = LiveGraph.resolveEvent(ev, er)
    val away = rec("away_team").head
    val expected = u.byType("team").find(_.name == ev.awayRef).map(t => KgBuilders.kgIdOf(t.id))
    if (away.startsWith("kg:")) assert(expected.contains(away))
  }

  test("ingesting an event makes the game queryable in real time") {
    val live = freshLive()
    val ev = SynthKG.liveEvents(u, 3).head
    live.ingest(LiveGraph.resolveEvent(ev, er))
    val engine = new KGQ.Engine(live.kv, live.index)
    val rows = engine.query("""FIND sports_game RETURN home_score, status LIMIT 5""")
    assert(rows.nonEmpty)
    assert(rows.head.values("home_score").nonEmpty)
  }

  test("live + stable queries compose: from a game to the venue's country") {
    val live = freshLive()
    val ev = SynthKG.liveEvents(u, 3).head
    val (id, rec) = LiveGraph.resolveEvent(ev, er)
    live.ingest((id, rec))
    if (rec("venue_city").head.startsWith("kg:")) {
      val engine = new KGQ.Engine(live.kv, live.index)
      val rows = engine.query(
        """FIND sports_game WHERE venue_city -> (type = "city") RETURN venue_city""")
      assert(rows.exists(_.id == id))
    }
  }

  test("curation BlockFact hot-fixes the live index (§4.3)") {
    val live = freshLive()
    val p = u.byType("person").head
    val pid = KgBuilders.kgIdOf(p.id)
    val bad = live.kv.get(pid).get("birth_year").head
    live.curate(LiveGraph.BlockFact(pid, "birth_year", bad))
    assert(!live.kv.get(pid).get.getOrElse("birth_year", Seq.empty).contains(bad))
  }

  test("curation EditFact replaces the value and reindexes") {
    val live = freshLive()
    val p = u.byType("person").head
    val pid = KgBuilders.kgIdOf(p.id)
    live.curate(LiveGraph.EditFact(pid, "name", p.name, "Corrected Name"))
    assert(live.kv.get(pid).get("name").contains("Corrected Name"))
    assert(live.index.lookup("Corrected Name", Some("name")).contains(pid))
    assert(!live.index.lookup(p.name, Some("name")).contains(pid))
  }

  test("curation BlockEntity removes the entity from stores entirely") {
    val live = freshLive()
    val p = u.byType("person").head
    val pid = KgBuilders.kgIdOf(p.id)
    live.curate(LiveGraph.BlockEntity(pid))
    assert(live.kv.get(pid).isEmpty)
    assert(!live.index.lookup(p.name, Some("name")).contains(pid))
  }

  test("curations are emitted as a correction stream for stable construction") {
    val live = freshLive()
    val pid = KgBuilders.kgIdOf(u.byType("person").head.id)
    live.curate(LiveGraph.BlockFact(pid, "birth_year", "1960"))
    live.curate(LiveGraph.EditFact(pid, "occupation", "actor", "director"))
    val drained = live.drainCorrections()
    assert(drained.size == 2)
    assert(live.drainCorrections().isEmpty) // drained exactly once
  }
}
