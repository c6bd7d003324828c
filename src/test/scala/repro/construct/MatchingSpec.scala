package repro.construct

import org.scalatest.funsuite.AnyFunSuite
import repro.ml.StringSim
import Matching._

/** Matching models and pair featurization (§2.3 step 4). */
class MatchingSpec extends AnyFunSuite {

  private def rec(id: String, name: String, attrs: Map[String, String] = Map.empty,
                  etype: String = "person", aliases: Seq[String] = Seq.empty,
                  isKg: Boolean = false) =
    Rec(id, etype, name, aliases, attrs, isKg)

  private val encoder = StringSim.trainEncoder(Seq(
    Seq("Robert Smith", "Bob Smith"),
    Seq("Robert Jones", "Bob Jones"),
    Seq("William Davis", "Bill Davis"),
  ))

  test("features: identical names maximize string features") {
    val f = features(rec("a", "Jane Doe"), rec("b", "Jane Doe"), None)
    assert(f.bestEditSim == 1.0)
    assert(f.bestQgramSim == 1.0)
    assert(f.tokenJaccard == 1.0)
  }

  test("features: aliases participate in best-pair similarity") {
    val f = features(
      rec("a", "Robert Smith", aliases = Seq("Bob Smith")),
      rec("b", "Bob Smith"), None)
    assert(f.bestEditSim == 1.0)
  }

  test("features: attribute agreement and conflict fractions") {
    val a = rec("a", "X", Map("birth_year" -> "1960", "occupation" -> "actor"))
    val b = rec("b", "X", Map("birth_year" -> "1960", "occupation" -> "writer"))
    val f = features(a, b, None)
    assert(f.attrAgree == 0.5)
    assert(f.attrConflict == 0.5)
  }

  test("features: no shared evidence attrs → zero agree/conflict") {
    val f = features(rec("a", "X", Map("birth_year" -> "1960")),
                     rec("b", "X", Map("occupation" -> "actor")), None)
    assert(f.attrAgree == 0.0 && f.attrConflict == 0.0 && f.sharedAttrs == 0.0)
  }

  test("features: learned similarity falls back to q-gram without an encoder") {
    val f = features(rec("a", "Robert"), rec("b", "Bob"), None)
    assert(f.learnedSim == f.bestQgramSim)
  }

  test("features: learned similarity captures the synonym with an encoder") {
    val f = features(rec("a", "Robert Smith"), rec("b", "Bob Smith"), Some(encoder))
    assert(f.learnedSim > f.bestQgramSim + 0.2)
  }

  test("default logistic model: exact duplicates score high") {
    val m = defaultModel(None)
    val p = m.prob(rec("a", "Jane Doe", Map("birth_year" -> "1960")),
                   rec("b", "Jane Doe", Map("birth_year" -> "1960")))
    assert(p > 0.9)
  }

  test("default logistic model: unrelated records score low") {
    val m = defaultModel(None)
    val p = m.prob(rec("a", "Jane Doe"), rec("b", "Carlos Ruiz"))
    assert(p < 0.2)
  }

  test("default model: conflicting evidence vetoes a name match") {
    val m = defaultModel(None)
    val agree = m.prob(rec("a", "Jane Doe", Map("birth_year" -> "1960", "birthplace" -> "Salem")),
                       rec("b", "Jane Doe", Map("birth_year" -> "1960", "birthplace" -> "Salem")))
    val conflict = m.prob(rec("a", "Jane Doe", Map("birth_year" -> "1960", "birthplace" -> "Salem")),
                          rec("b", "Jane Doe", Map("birth_year" -> "1987", "birthplace" -> "Dover")))
    assert(agree > conflict + 0.3)
  }

  test("cross-type pairs never match") {
    val m = defaultModel(None)
    assert(m.prob(rec("a", "Jane Doe"), rec("b", "Jane Doe", etype = "movie")) == 0.0)
    assert(RuleModel(None).prob(rec("a", "Jane Doe"), rec("b", "Jane Doe", etype = "movie")) == 0.0)
  }

  test("nickname duplicates need the learned encoder to clear the link threshold") {
    val a = rec("a", "Robert Smith", Map("birth_year" -> "1960"))
    val b = rec("b", "Bob Smith", Map("birth_year" -> "1960"))
    val without = defaultModel(None).prob(a, b)
    val withEnc = defaultModel(Some(encoder)).prob(a, b)
    assert(withEnc > without)
    assert(withEnc > 0.85, s"withEnc=$withEnc")
  }

  test("rule model probability ladder") {
    val m = RuleModel(None)
    val exact = m.prob(rec("a", "Jane Doe"), rec("b", "Jane Doe"))
    assert(exact == 0.98)
    val conflict = m.prob(
      rec("a", "Jane Doe", Map("birth_year" -> "1960", "birthplace" -> "X")),
      rec("b", "Jane Doe", Map("birth_year" -> "1980", "birthplace" -> "Y")))
    assert(conflict == 0.02)
  }

  test("trainLogistic separates clean positives from negatives") {
    val pos = (1 to 30).map(i => (rec(s"p$i", s"Name$i Foo", Map("birth_year" -> i.toString)),
                                  rec(s"q$i", s"Name$i Foo", Map("birth_year" -> i.toString)), true))
    val neg = (1 to 30).map(i => (rec(s"x$i", s"Name$i Foo"),
                                  rec(s"y$i", s"Other${i + 1} Bar"), false))
    val m = trainLogistic(pos ++ neg, None, epochs = 80)
    val pPos = m.prob(rec("t1", "Fresh Case", Map("birth_year" -> "7")),
                      rec("t2", "Fresh Case", Map("birth_year" -> "7")))
    val pNeg = m.prob(rec("t3", "Fresh Case"), rec("t4", "Unrelated Name"))
    assert(pPos > 0.8, s"pPos=$pPos")
    assert(pNeg < 0.3, s"pNeg=$pNeg")
  }

  test("prob is symmetric for the default model") {
    val m = defaultModel(Some(encoder))
    val a = rec("a", "Robert Smith", Map("birth_year" -> "1960"))
    val b = rec("b", "Bob Smith", Map("birth_year" -> "1960"))
    assert(math.abs(m.prob(a, b) - m.prob(b, a)) < 1e-9)
  }
}
