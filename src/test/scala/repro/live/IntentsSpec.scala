package repro.live

import repro.{SparkSpec, SynthKG}
import repro.engine.Importance
import repro.exp.KgBuilders
import repro.ml.Nerd

/** Intent routing and the multi-turn context graph (§4.2). */
class IntentsSpec extends SparkSpec {

  private lazy val u = SynthKG.universe(6)
  private lazy val kg = repro.core.Dataflow.pin(KgBuilders.directKG(spark, u))
  private lazy val er = new Nerd.Index(
    Nerd.buildEntries(kg, Importance.importanceView(kg, prIterations = 3)),
    KgBuilders.encoderFor(u))

  private def engine(): Intents.Engine = {
    val live = new LiveGraph()
    live.loadStable(LiveGraph.stableView(kg))
    new Intents.Engine(live, er)
  }

  // pick a person with a distinctive (unique-in-universe) name
  private lazy val person = {
    val counts = u.byType("person").groupBy(_.name).view.mapValues(_.size).toMap
    u.byType("person").find(p => counts(p.name) == 1 && p.refs.contains("birthplace")).get
  }

  test("AgeOf intent routes to birth_year for persons") {
    val res = engine().handle("AgeOf", person.name)
    assert(res.isDefined)
    assert(res.get.predicate == "birth_year")
    assert(res.get.answers == Seq(person.attrs("birth_year")))
  }

  test("Birthplace intent returns the display name of the referenced entity") {
    val res = engine().handle("Birthplace", person.name)
    assert(res.isDefined)
    val cityName = u.nameOf(person.refs("birthplace"))
    assert(res.get.answers.contains(cityName))
  }

  test("HeadOfState(country) resolves to prime_minister — the paper's routing example") {
    // countries carry no prime_minister fact in the universe, but routing
    // must still choose the right predicate
    val country = u.byType("country").head
    val res = engine().handle("HeadOfState", country.name)
    assert(res.isDefined)
    assert(res.get.predicate == "prime_minister")
  }

  test("HeadOfState(city) resolves to mayor") {
    val city = u.byType("city").head
    val res = engine().handleResolved("HeadOfState", KgBuilders.kgIdOf(city.id))
    assert(res.isDefined)
    assert(res.get.predicate == "mayor")
  }

  test("unroutable intents return None") {
    val movie = u.byType("movie").head
    assert(engine().handleResolved("HeadOfState", KgBuilders.kgIdOf(movie.id)).isEmpty)
  }

  test("follow-up with a new argument reuses the previous intent (How about X?)") {
    val e = engine()
    val counts = u.byType("person").groupBy(_.name).view.mapValues(_.size).toMap
    val other = u.byType("person").reverse
      .find(p => counts(p.name) == 1 && p.id != person.id).get
    e.handle("AgeOf", person.name)
    val res = e.followUpNewArg(other.name)
    assert(res.isDefined)
    assert(res.get.predicate == "birth_year")
    assert(res.get.argumentId == KgBuilders.kgIdOf(other.id))
  }

  test("follow-up intent binds its argument from the previous answer (Where is she from?)") {
    val e = engine()
    // SpouseOf requires a spouse fact; persons in the universe have
    // birthplace refs — emulate the paper's flow with Birthplace→located_in
    val res1 = e.handle("Birthplace", person.name)
    assert(res1.isDefined && res1.get.answerIds.nonEmpty)
    val res2 = e.followUpNewIntent("PopulationOf") // of the birthplace city
    assert(res2.isDefined)
    assert(res2.get.argumentId == res1.get.answerIds.head)
    assert(res2.get.predicate == "population")
  }

  test("follow-up without prior context returns None") {
    assert(engine().followUpNewArg("whoever").isEmpty)
    assert(engine().followUpNewIntent("Birthplace").isEmpty)
  }

  test("utterance front-end parses 'how old is X'") {
    val res = engine().utterance(s"How old is ${person.name}?")
    assert(res.isDefined)
    assert(res.get.predicate == "birth_year")
  }

  test("utterance front-end drives the multi-turn flow") {
    val e = engine()
    val counts = u.byType("person").groupBy(_.name).view.mapValues(_.size).toMap
    val other = u.byType("person").reverse
      .find(p => counts(p.name) == 1 && p.id != person.id).get
    assert(e.utterance(s"How old is ${person.name}").isDefined)
    val follow = e.utterance(s"How about ${other.name}")
    assert(follow.isDefined)
    assert(follow.get.predicate == "birth_year")
    assert(follow.get.argumentId == KgBuilders.kgIdOf(other.id))
  }

  test("unknown utterances return None") {
    assert(engine().utterance("please compile my code").isEmpty)
  }
}
