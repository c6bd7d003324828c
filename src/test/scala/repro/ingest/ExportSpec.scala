package repro.ingest

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthKG}
import repro.core.Schema

/** Export to extended triples (§2.2) including one-hop triplication. */
class ExportSpec extends SparkSpec {
  import spark.implicits._

  private lazy val u = SynthKG.universe(4)
  private lazy val recs = SynthKG.sourceRecords(u, SynthKG.sourceConfigs.head, 0)
  private lazy val rows = SynthKG.recordsToRows(spark, recs)
  private lazy val stable = Export.stableTriples(rows)
  private lazy val volat = Export.volatileTriples(rows)

  test("stable triples follow the canonical schema") {
    assert(stable.columns.toSeq == Schema.columns)
  }

  test("every record yields type and name triples") {
    val t = stable.filter(col(Schema.Predicate) === "type").count()
    val n = stable.filter(col(Schema.Predicate) === "name").count()
    assert(t == recs.size && n == recs.size)
  }

  test("composite facts carry relationship ids and predicates (extended triples)") {
    val comp = stable.filter(col(Schema.RId).isNotNull)
    val persons = recs.filter(_.compositePred.contains("educated_at"))
    assert(persons.nonEmpty)
    assert(comp.count() > 0)
    val sampleRid = comp.select(Schema.RId).head().getString(0)
    assert(sampleRid.contains("#r"))
    val rps = comp.select(Schema.RPredicate).distinct().as[String].collect().toSet
    assert(rps.subsetOf(Set("school", "degree", "year", "group", "role", "since")))
  }

  test("the one-hop triplication means no self-joins are needed downstream (§2.4)") {
    // the school of a person is retrievable by a plain filter
    val schools = stable.filter(col(Schema.Predicate) === "educated_at" &&
                                col(Schema.RPredicate) === "school")
    assert(schools.count() > 0)
  }

  test("provenance arrays carry the source and its trust") {
    val src = SynthKG.sourceConfigs.head
    val bad = stable.filter(
      col(Schema.Sources) =!= array(lit(src.name)) ||
      col(Schema.Trust) =!= array(lit(src.trust))).count()
    assert(bad == 0)
  }

  test("no null or empty objects are exported") {
    assert(stable.filter(col(Schema.Obj).isNull || trim(col(Schema.Obj)) === "").count() == 0)
  }

  test("volatile dump contains exactly the popularity facts") {
    assert(volat.count() == recs.size)
    assert(volat.filter(col(Schema.Predicate) =!= "popularity").count() == 0)
  }

  test("volatile facts are excluded from the stable export") {
    assert(stable.filter(col(Schema.Predicate) === "popularity").count() == 0)
  }

  test("fromWide melts aligned rows and adds type triples") {
    val aligned = Seq(("m1", "movie", "The X", "drama"))
      .toDF("id", "etype", "name", "genre")
    val (st, vo) = Export.fromWide(aligned, "moviedb", 0.8)
    val preds = st.select(Schema.Predicate).as[String].collect().toSet
    assert(preds == Set("name", "genre", "type"))
    assert(vo.count() == 0)
  }

  test("fromWide routes volatile predicates to the volatile dump") {
    val aligned = Seq(("m1", "movie", "The X", "0.7"))
      .toDF("id", "etype", "name", "popularity")
    val (st, vo) = Export.fromWide(aligned, "moviedb", 0.8, Set("popularity"))
    assert(st.filter(col(Schema.Predicate) === "popularity").count() == 0)
    assert(vo.count() == 1)
  }

  test("fromWide drops null-valued predicates") {
    val aligned = Seq(("m1", "movie", "The X", null: String))
      .toDF("id", "etype", "name", "genre")
    val (st, _) = Export.fromWide(aligned, "moviedb", 0.8)
    assert(st.filter(col(Schema.Predicate) === "genre").count() == 0)
  }
}
