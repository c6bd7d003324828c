package repro.ingest

import repro.SparkSpec

/** Predicate generation functions / ontology alignment (§2.2). */
class AlignmentSpec extends SparkSpec {
  import spark.implicits._
  import Alignment._

  private def movieRows() = Seq(
    ("m1", "The Silent Horizon", "2", "thriller", "2001"),
    ("m2", "Crimson Empire", null, "drama", "1999"),
  ).toDF("movie_id", "title", "sequel_number", "category", "year")

  private val movieCfg = Config("movie", "movie_id", Seq(
    Rename("title", "name"),
    Rename("category", "genre"),                   // the paper's category → genre example
    Rename("year", "release_year"),
    Combine(Seq("title", "sequel_number"), "full_title"),
  ))

  test("rename maps a source predicate to a KG predicate") {
    val out = align(movieRows(), movieCfg).orderBy("id").collect()
    assert(out(0).getAs[String]("genre") == "thriller")
  }

  test("combine concatenates source predicates (title + sequel_number → full_title)") {
    val out = align(movieRows(), movieCfg).orderBy("id").collect()
    assert(out(0).getAs[String]("full_title") == "The Silent Horizon 2")
  }

  test("combine skips null parts") {
    val out = align(movieRows(), movieCfg).orderBy("id").collect()
    assert(out(1).getAs[String]("full_title") == "Crimson Empire")
  }

  test("aligned output carries id and etype") {
    val out = align(movieRows(), movieCfg)
    assert(out.columns.take(2).toSeq == Seq("id", "etype"))
    assert(out.select("etype").distinct().head().getString(0) == "movie")
  }

  test("constant PGF emits a fixed value") {
    val cfg = Config("movie", "movie_id", Seq(
      Rename("title", "name"), Constant("language", "en")))
    val out = align(movieRows(), cfg).collect()
    assert(out.forall(_.getAs[String]("language") == "en"))
  }

  test("expression PGF evaluates Spark SQL over the source row") {
    val cfg = Config("movie", "movie_id", Seq(
      Rename("title", "name"),
      Expr("CAST(year AS INT) + 1", "release_year")))
    val out = align(movieRows(), cfg).orderBy("id").collect()
    assert(out(0).getAs[String]("release_year") == "2002")
  }

  test("config rejects unknown ontology types") {
    intercept[IllegalArgumentException] {
      Config("starship", "id", Seq(Rename("a", "name")))
    }
  }

  test("config rejects targets outside the type's ontology predicates") {
    intercept[IllegalArgumentException] {
      Config("movie", "movie_id", Seq(Rename("title", "not_a_predicate")))
    }
  }

  test("config rejects duplicate target predicates") {
    intercept[IllegalArgumentException] {
      Config("movie", "movie_id", Seq(Rename("title", "name"), Rename("category", "name")))
    }
  }

  test("missing source predicate surfaces as null, not an error") {
    val rows = Seq(("m1", "X")).toDF("movie_id", "title")
    val cfg = Config("movie", "movie_id", Seq(
      Rename("title", "name"),
      Expr("CAST(NULL AS STRING)", "genre")))
    val out = align(rows, cfg).head()
    assert(out.getAs[String]("genre") == null)
  }

  test("subjects stay in the source namespace after alignment") {
    val out = align(movieRows(), movieCfg).select("id").collect().map(_.getString(0))
    assert(out.toSet == Set("m1", "m2")) // linked to KG ids only later (§2.2)
  }
}
