package repro.engine

import org.apache.spark.sql.functions._
import repro.{Oracle, SparkSpec}
import repro.core.Schema

/** Entity importance (§3.3): degrees, identities, PageRank, aggregate. */
class ImportanceSpec extends SparkSpec {
  import spark.implicits._

  // a small star graph: hub ← s1, s2, s3; hub → t
  private def kg() = Schema.fromTuples(spark,
    Seq(
      ("kg:hub", "name", null, null, "Hub", "en", Seq("a", "b"), Seq(0.9, 0.8), 0.9),
      ("kg:hub", "linked", null, null, "kg:t", "en", Seq("a"), Seq(0.9), 0.9),
      ("kg:t", "name", null, null, "T", "en", Seq("a"), Seq(0.9), 0.9),
    ) ++ (1 to 3).map(i =>
      (s"kg:s$i", "ref", null: String, null: String, "kg:hub", "en", Seq("a"), Seq(0.9), 0.9))
  )

  test("edges extracts only entity-to-entity facts") {
    val e = Importance.edges(kg()).as[(String, String)].collect().toSet
    assert(e == Set(("kg:hub", "kg:t"), ("kg:s1", "kg:hub"), ("kg:s2", "kg:hub"), ("kg:s3", "kg:hub")))
  }

  test("self-loops are excluded from edges") {
    val df = Schema.fromTuples(spark, Seq(
      ("kg:a", "ref", null, null, "kg:a", "en", Seq("s"), Seq(0.9), 0.9)))
    assert(Importance.edges(df).count() == 0)
  }

  test("degrees: the hub has in-degree 3 and out-degree 1") {
    val d = Importance.degrees(kg()).collect().map(r =>
      r.getString(0) -> (r.getLong(1), r.getLong(2))).toMap
    assert(d("kg:hub") == ((1L, 3L))) // (outDegree, inDegree)
  }

  test("degrees default to zero for isolated subjects") {
    val d = Importance.degrees(kg()).filter(col("id") === "kg:s1").head()
    assert(d.getAs[Long]("inDegree") == 0L)
    assert(d.getAs[Long]("outDegree") == 1L)
  }

  test("degrees match the DuckDB oracle") {
    val e = Importance.edges(kg())
    Oracle.assertEquivalent(
      Importance.degrees(kg()).select(col("id"), col("inDegree").cast("string").as("ind")),
      """SELECT n.id AS id, CAST(COALESCE(c.ind, 0) AS VARCHAR) AS ind
         FROM (SELECT DISTINCT subject AS id FROM kg) n
         LEFT JOIN (SELECT dst, COUNT(*) AS ind FROM e GROUP BY dst) c ON n.id = c.dst""",
      "kg" -> kg().select("subject"), "e" -> e)
  }

  test("identities counts distinct contributing sources (§3.3)") {
    val ids = Importance.identities(kg()).collect().map(r => r.getString(0) -> r.getLong(1)).toMap
    assert(ids("kg:hub") == 2L) // sources a and b
    assert(ids("kg:t") == 1L)
  }

  test("pagerank sums to ~1 and favours the hub") {
    val pr = Importance.pagerank(kg(), iterations = 15).collect()
      .map(r => r.getString(0) -> r.getDouble(1)).toMap
    assert(math.abs(pr.values.sum - 1.0) < 1e-3)
    assert(pr("kg:hub") > pr("kg:s1"))
    assert(pr("kg:t") > pr("kg:s1")) // receives the hub's mass
  }

  test("pagerank of an empty graph is empty") {
    val pr = Importance.pagerank(Schema.emptyTriples(spark))
    assert(pr.count() == 0)
  }

  test("importance view carries all four metrics and the aggregate") {
    val v = Importance.importanceView(kg(), prIterations = 8)
    assert(v.columns.toSet ==
      Set("id", "inDegree", "outDegree", "identities", "pagerank", "importance"))
    val scores = v.collect().map(r => r.getString(0) -> r.getAs[Double]("importance")).toMap
    assert(scores("kg:hub") > scores("kg:s1"))
    assert(scores.values.forall(s => s >= 0.0 && s <= 1.0))
  }

  test("degree alone does not dominate: multi-source identity lifts importance") {
    // two nodes with equal degree; one has 2 sources
    val df = Schema.fromTuples(spark, Seq(
      ("kg:a", "name", null, null, "A", "en", Seq("s1", "s2", "s3"), Seq(0.9, 0.8, 0.7), 0.9),
      ("kg:b", "name", null, null, "B", "en", Seq("s1"), Seq(0.9), 0.9)))
    val scores = Importance.importanceView(df, prIterations = 2).collect()
      .map(r => r.getString(0) -> r.getAs[Double]("importance")).toMap
    assert(scores("kg:a") > scores("kg:b"))
  }
}
