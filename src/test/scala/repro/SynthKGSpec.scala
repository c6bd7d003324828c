package repro

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Ontology

/** The synthetic universe and source payload generators (DESIGN.md §3). */
class SynthKGSpec extends AnyFunSuite {

  private lazy val u = SynthKG.universe(10)

  test("universe is deterministic in (scale, seed)") {
    val a = SynthKG.universe(6, 3)
    val b = SynthKG.universe(6, 3)
    assert(a.entities.map(_.id) == b.entities.map(_.id))
    assert(a.entities.map(_.name) == b.entities.map(_.name))
  }

  test("universe covers every ontology entity type") {
    assert(u.byType.keySet == Ontology.entityTypes.toSet)
  }

  test("entity counts scale linearly") {
    val small = SynthKG.universe(5)
    val big = SynthKG.universe(10)
    assert(big.byType("person").size == 2 * small.byType("person").size)
  }

  test("true ids are unique") {
    assert(u.entities.map(_.id).distinct.size == u.entities.size)
  }

  test("entity references point at existing entities of the expected type") {
    for (e <- u.entities; (p, tid) <- e.refs) {
      val target = u.byId.get(tid)
      assert(target.isDefined, s"$p of ${e.id} dangles")
      val expected = Ontology.entityRefPredicates.get(p)
      expected.foreach { t =>
        // located_in of cities/schools points at countries; home_city at cities
        assert(target.get.etype == t || (p == "located_in" && target.get.etype == "country"),
          s"$p → ${target.get.etype}")
      }
    }
  }

  test("persons carry educated_at composites referencing schools") {
    val p = u.byType("person").head
    val (pred, rmap) = p.composites.head
    assert(pred == "educated_at")
    assert(rmap.keySet == Set("school", "degree", "year"))
    assert(u.byId(rmap("school")).etype == "school")
  }

  test("city base names repeat (ambiguous surface forms for NERD)") {
    // 2*scale cities over a fixed pool of base names → guaranteed repeats
    val names = SynthKG.universe(15).byType("city").map(_.name)
    assert(names.distinct.size < names.size)
  }

  test("nickname aliases exist for persons with nicknameable first names") {
    val withNick = u.byType("person").filter { p =>
      val fn = p.name.split(' ').head
      SynthKG.nicknames.contains(fn)
    }
    assert(withNick.nonEmpty)
    withNick.take(5).foreach { p =>
      val fn = p.name.split(' ').head
      val nicks = SynthKG.nicknames(fn)
      assert(p.aliases.exists(a => nicks.exists(a.startsWith)), s"${p.name} → ${p.aliases}")
    }
  }

  test("source records are deterministic") {
    val cfg = SynthKG.sourceConfigs.head
    val a = SynthKG.sourceRecords(u, cfg, 0)
    val b = SynthKG.sourceRecords(u, cfg, 0)
    assert(a == b)
  }

  test("source ids are namespaced and unique") {
    val cfg = SynthKG.sourceConfigs.head
    val recs = SynthKG.sourceRecords(u, cfg, 0)
    assert(recs.map(_.id).distinct.size == recs.size)
    assert(recs.forall(_.id.startsWith(cfg.name + ":")))
  }

  test("coverage respects per-type configuration") {
    val music = SynthKG.sourceConfigs.find(_.name == "musicdb").get
    val recs = SynthKG.sourceRecords(u, music, 0)
    assert(recs.forall(r => music.coverage.contains(r.etype)))
    // musicians are covered at 0.95 — nearly all of them appear
    val nMus = recs.count(r => r.etype == "musician" && !r.id.endsWith("_d"))
    assert(nMus > u.byType("musician").size * 0.5)
  }

  test("noisy sources produce in-source duplicates") {
    val fan = SynthKG.sourceConfigs.find(_.name == "fanwiki").get
    val big = SynthKG.universe(40)
    val recs = SynthKG.sourceRecords(big, fan, 0)
    assert(recs.exists(_.id.endsWith("_d")))
  }

  test("epochs grow coverage monotonically (entry ramp)") {
    val cfg = SynthKG.sourceConfigs.head.copy(entryFrac = 0.3)
    val e0 = SynthKG.sourceRecords(u, cfg, 0).map(_.trueId).toSet
    val e4 = SynthKG.sourceRecords(u, cfg, 4).map(_.trueId).toSet
    assert(e0.size < e4.size)
  }

  test("churn produces value drift across epochs for some entities") {
    val cfg = SynthKG.sourceConfigs.head
    val big = SynthKG.universe(30)
    val r0 = SynthKG.sourceRecords(big, cfg, 0).map(r => r.id -> r.attrs).toMap
    val r3 = SynthKG.sourceRecords(big, cfg, 3).map(r => r.id -> r.attrs).toMap
    val common = r0.keySet.intersect(r3.keySet)
    assert(common.exists(id => r0(id) != r3(id)), "expected at least one updated record")
  }

  test("volatile popularity is present on every record and churns every epoch") {
    val cfg = SynthKG.sourceConfigs.head
    val r0 = SynthKG.sourceRecords(u, cfg, 0)
    assert(r0.forall(_.volatile.contains("popularity")))
    val r1 = SynthKG.sourceRecords(u, cfg, 1).map(r => r.id -> r.volatile).toMap
    val byId0 = r0.map(r => r.id -> r.volatile).toMap
    val common = byId0.keySet.intersect(r1.keySet)
    assert(common.count(id => byId0(id) != r1(id)) > common.size / 2)
  }

  test("typo generator changes the string but not drastically") {
    val s = "Springfield"
    val t = SynthKG.typo(s, "k1")
    assert(t != s)
    assert(math.abs(t.length - s.length) <= 1)
  }

  test("mentions carry ground truth and context from related entities") {
    val ms = SynthKG.mentions(u, 50)
    assert(ms.size == 50)
    assert(ms.forall(m => u.byId.contains(m.trueId)))
    assert(ms.forall(_.context.nonEmpty))
  }

  test("mention corpus mixes head and tail entities") {
    val ms = SynthKG.mentions(u, 200)
    assert(ms.exists(_.head) && ms.exists(!_.head))
  }

  test("obr records carry type hints from the ontology") {
    val rs = SynthKG.obrRecords(u, 30)
    assert(rs.forall(r => Ontology.isType(r.typeHint)))
    assert(rs.forall(r => u.byId.contains(r.trueId)))
  }

  test("live events reference teams and venues by surface form") {
    val evs = SynthKG.liveEvents(u, 20)
    assert(evs.size == 20)
    assert(evs.forall(e => e.payload.contains("home_score")))
    val teamNames = u.byType("team").flatMap(_.allNames).toSet
    assert(evs.forall(e => teamNames.contains(e.homeRef)))
  }

  test("unitHash is stable and in [0,1)") {
    assert(SynthKG.unitHash("x") == SynthKG.unitHash("x"))
    (1 to 100).foreach { i =>
      val h = SynthKG.unitHash(s"k$i")
      assert(h >= 0.0 && h < 1.0)
    }
  }
}
