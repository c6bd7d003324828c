package repro.construct

import repro.SparkSpec

/** Blocking and pair generation (§2.3 steps 3–4). */
class BlockingSpec extends SparkSpec {
  import spark.implicits._

  test("keysForName emits prefix, token and skeleton keys") {
    val ks = Blocking.keysForName("Robert Smith")
    assert(ks.exists(_.startsWith("p:")))
    assert(ks.exists(_.startsWith("t:")))
    assert(ks.exists(_.startsWith("s:")))
  }

  test("keysForName of an empty name is empty") {
    assert(Blocking.keysForName("").isEmpty)
  }

  test("typo variants share at least one blocking key") {
    val a = Blocking.keysForName("Springfield Wolves").toSet
    val b = Blocking.keysForName("Springfeld Wolves").toSet // vowel dropped
    assert(a.intersect(b).nonEmpty)
  }

  test("token reordering shares the token-sort key") {
    val a = Blocking.keysForName("Smith Robert").toSet
    val b = Blocking.keysForName("Robert Smith").toSet
    assert(a.intersect(b).nonEmpty)
  }

  test("keysForRecord is type-scoped — same name, different type never collides") {
    val p = Blocking.keysForRecord("person", "Hanover", Seq.empty).toSet
    val c = Blocking.keysForRecord("city", "Hanover", Seq.empty).toSet
    assert(p.intersect(c).isEmpty)
  }

  test("aliases contribute keys") {
    val ks = Blocking.keysForRecord("person", "Robert Smith", Seq("Bob Smith"))
    assert(ks.exists(_.contains("bob")))
  }

  test("blocks assigns co-blocked ids for similar names") {
    val recs = Seq(
      ("a", "person", "Robert Smith", Seq.empty[String]),
      ("b", "person", "Robert Smyth", Seq.empty[String]),
      ("c", "person", "Zelda Quinn", Seq.empty[String]),
    ).toDF("id", "etype", "name", "aliases")
    val pairs = Blocking.candidatePairs(Blocking.blocks(recs)).as[(String, String)].collect().toSet
    assert(pairs.contains(("a", "b")))
    assert(!pairs.contains(("a", "c")) && !pairs.contains(("b", "c")))
  }

  test("pairs are unordered and deduplicated") {
    val recs = Seq(
      ("a", "person", "Robert Smith", Seq.empty[String]),
      ("b", "person", "Robert Smith", Seq.empty[String]),
    ).toDF("id", "etype", "name", "aliases")
    val pairs = Blocking.candidatePairs(Blocking.blocks(recs)).as[(String, String)].collect()
    assert(pairs.toSeq == Seq(("a", "b")))
  }

  test("oversized blocks are dropped (quadratic blow-up guard)") {
    val recs = (1 to 30).map(i => (s"id$i", "person", "Common Name", Seq.empty[String]))
      .toDF("id", "etype", "name", "aliases")
    val pairs = Blocking.candidatePairs(Blocking.blocks(recs, maxBlockSize = 10)).count()
    assert(pairs == 0)
  }

  test("within-limit blocks produce all n-choose-2 pairs") {
    val recs = (1 to 5).map(i => (s"id$i", "person", "Common Name", Seq.empty[String]))
      .toDF("id", "etype", "name", "aliases")
    val pairs = Blocking.candidatePairs(Blocking.blocks(recs, maxBlockSize = 10)).count()
    assert(pairs == 10)
  }
}
