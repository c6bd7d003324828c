package repro.core

import org.scalatest.funsuite.AnyFunSuite

/** The in-house ontology (§2) and intent semantics (§4.2). */
class OntologySpec extends AnyFunSuite {

  test("every entity type has predicates") {
    Ontology.entityTypes.foreach(t => assert(Ontology.typePredicates(t).nonEmpty))
  }

  test("every entity type carries name") {
    Ontology.entityTypes.foreach(t => assert(Ontology.typePredicates(t).contains("name")))
  }

  test("composite predicates declare their relationship predicates") {
    assert(Ontology.compositePredicates("educated_at") == Seq("school", "degree", "year"))
  }

  test("popularity is volatile") {
    assert(Ontology.volatilePredicates.contains(Ontology.Popularity))
  }

  test("entity-reference predicates map to known entity types") {
    Ontology.entityRefPredicates.values.foreach(t => assert(Ontology.isType(t), t))
  }

  test("composite entity-reference keys use the pred.rpred form") {
    assert(Ontology.entityRefPredicates.contains("educated_at.school"))
  }

  test("match evidence predicates exist for every type") {
    Ontology.entityTypes.foreach(t => assert(Ontology.matchEvidencePredicates.contains(t)))
  }

  test("match evidence predicates are drawn from the type's predicates") {
    for ((t, preds) <- Ontology.matchEvidencePredicates; p <- preds)
      assert(Ontology.typePredicates(t).contains(p) ||
             Ontology.entityRefPredicates.contains(p), s"$t.$p")
  }

  test("intent routing: HeadOfState of a country is prime_minister") {
    assert(Ontology.resolveIntent("HeadOfState", "country").contains("prime_minister"))
  }

  test("intent routing: HeadOfState of a city is mayor (paper's example)") {
    assert(Ontology.resolveIntent("HeadOfState", "city").contains("mayor"))
  }

  test("intent routing: no meaningful interpretation → None") {
    assert(Ontology.resolveIntent("HeadOfState", "movie").isEmpty)
    assert(Ontology.resolveIntent("NoSuchIntent", "person").isEmpty)
  }

  test("SpouseOf works for persons and musicians") {
    assert(Ontology.resolveIntent("SpouseOf", "person").contains("spouse"))
    assert(Ontology.resolveIntent("SpouseOf", "musician").contains("spouse"))
  }

  test("isType rejects unknown types") {
    assert(!Ontology.isType("starship"))
  }
}
