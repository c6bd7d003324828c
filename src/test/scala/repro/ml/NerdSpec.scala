package repro.ml

import repro.{SparkSpec, SynthKG}
import repro.engine.Importance
import repro.exp.KgBuilders

/** The NERD stack (§5.2): entity view, candidate retrieval, contextual
  * disambiguation with rejection; the popularity baseline contrast.
  */
class NerdSpec extends SparkSpec {

  private lazy val u = SynthKG.universe(15)
  private lazy val kg = repro.core.Dataflow.pin(KgBuilders.directKG(spark, u))
  private lazy val entries = Nerd.buildEntries(kg, Importance.importanceView(kg, prIterations = 4))
  private lazy val encoder = KgBuilders.encoderFor(u)
  private lazy val index = new Nerd.Index(entries, encoder)
  private lazy val baseline = new Nerd.PopularityBaseline(entries)

  private def kgId(tid: String) = KgBuilders.kgIdOf(tid)

  test("entity view has one record per KG entity") {
    assert(entries.size == u.entities.size)
  }

  test("entity view records carry names, types and importance") {
    val e = entries.find(_.id == kgId(u.byType("person").head.id)).get
    assert(e.names.nonEmpty)
    assert(e.types == Seq("person"))
    assert(e.importance >= 0.0)
  }

  test("entity view summarizes relationships with neighbor names (the Hanover signal)") {
    val person = u.byType("person").head
    val e = entries.find(_.id == kgId(person.id)).get
    val city = u.nameOf(person.refs("birthplace"))
    assert(e.relationships.exists(r => r.startsWith("birthplace ") && r.contains(city)),
      s"${e.relationships}")
  }

  test("entity view includes neighbor types") {
    val person = u.byType("person").head
    val e = entries.find(_.id == kgId(person.id)).get
    assert(e.neighborTypes.contains("city"))
  }

  test("candidate retrieval finds exact names") {
    val person = u.byType("person").head
    val cands = index.candidates(person.name)
    assert(cands.exists(_.id == kgId(person.id)))
  }

  test("candidate retrieval honours type hints") {
    // an ambiguous city base name shared with nothing else typed 'city'
    val city = u.byType("city").head
    val cands = index.candidates(city.name, typeHint = Some("city"))
    assert(cands.nonEmpty)
    assert(cands.forall(_.types.contains("city")))
  }

  test("candidate retrieval reaches nickname aliases through the learned vocabulary") {
    val person = u.byType("person")
      .find(p => SynthKG.nicknames.contains(p.name.split(' ').head)).get
    val nick = SynthKG.nicknames(person.name.split(' ').head).head
    val mention = s"$nick ${person.name.split(' ').last}"
    val cands = index.candidates(mention, k = 20)
    assert(cands.nonEmpty)
  }

  test("disambiguation resolves an unambiguous mention with high confidence") {
    val musician = u.byType("musician").head
    val ctx = musician.attrs.values.toSeq ++ Seq(u.nameOf(musician.refs("birthplace")))
    val pred = index.disambiguate(musician.name, ctx)
    assert(pred.isDefined)
    assert(pred.get.id == kgId(musician.id))
    assert(pred.get.confidence > 0.8, pred.get.confidence.toString)
  }

  test("ambiguous mention without context gets low confidence (rejection mechanism)") {
    // a city base name shared by several cities
    val dup = u.byType("city").groupBy(_.name).values.filter(_.size > 1).head
    val pred = index.disambiguate(dup.head.name, context = Seq.empty, typeHint = Some("city"))
    assert(pred.isDefined)
    assert(pred.get.confidence < 0.9, pred.get.confidence.toString)
  }

  test("context disambiguates the Hanover case: related names pick the right city") {
    // pick a duplicated city name where the duplicates sit in different
    // countries, and target the *less* popular one
    val dup = u.byType("city").groupBy(_.name).values
      .filter(g => g.size > 1 && g.map(_.refs("located_in")).distinct.size > 1).head
    val byPop = dup.sortBy(-_.popularity)
    val target = byPop.find(c =>
      c.refs("located_in") != byPop.head.refs("located_in")).getOrElse(byPop.last)
    val country = u.nameOf(target.refs("located_in"))
    val pred = index.disambiguate(target.name, context = country.split(' ').toSeq,
                                  typeHint = Some("city"))
    assert(pred.isDefined)
    assert(pred.get.id == kgId(target.id), s"picked ${pred.get.id}")
  }

  test("no candidates → None (rejection of out-of-KG mentions)") {
    assert(index.disambiguate("Zzyzx Qwwqq", Seq.empty).isEmpty)
  }

  test("baseline resolves head mentions but defaults to importance on ambiguity") {
    val dup = u.byType("city").groupBy(_.name).values.filter(_.size > 1).head
    // the baseline ranks by the structural importance score of the index,
    // so on an ambiguous name it returns the most important duplicate
    val impOf = entries.map(e => e.id -> e.importance).toMap
    val mostImportant = dup.maxBy(c => impOf.getOrElse(kgId(c.id), 0.0))
    val pred = baseline.disambiguate(dup.head.name)
    assert(pred.isDefined)
    assert(pred.get.id == kgId(mostImportant.id))
  }

  test("unseen nickname variants: learned retrieval + context beat the string baseline") {
    // Pick a person whose first name has two nicknames but whose KG alias
    // uses only one of them; mention with the *other* — a rendering never
    // stored in the KG, resolvable only through the learned synonym space.
    val candidates = u.byType("person").flatMap { p =>
      val fn = p.name.split(' ').head
      val ln = p.name.split(' ').last
      SynthKG.nicknames.get(fn).flatMap { nicks =>
        nicks.map(n => s"$n $ln").find(v => !p.allNames.contains(v)).map(v => (p, v))
      }
    }
    assert(candidates.nonEmpty)
    // use one whose surname is reasonably distinctive among these picks
    val (person, unseen) = candidates.head
    val ctx = (u.nameOf(person.refs("birthplace")) +: person.attrs.values.toSeq)
      .flatMap(_.split(' '))
    val nerdPred = index.disambiguate(unseen, ctx, k = 20)
    val basePred = baseline.disambiguate(unseen, k = 20)
    val nerdConf = nerdPred.map(_.confidence).getOrElse(0.0)
    val baseConf = basePred.map(_.confidence).getOrElse(0.0)
    // the learned stack must be at least as confident on the unseen variant
    assert(nerdConf >= baseConf - 0.05, s"nerd=$nerdConf base=$baseConf")
    assert(nerdPred.isDefined)
  }
}
