package repro.ingest

import java.nio.file.Files
import org.apache.spark.sql.functions._
import repro.SparkSpec
import repro.core.Schema

/** The full self-serve ingestion pipeline (§2.2, Figure 3): Import →
  * Transform → Align → Delta → Export, built from the platform templates.
  */
class IngestPipelineSpec extends SparkSpec {
  import spark.implicits._

  private def rawMovies(version: Int) = {
    val base = Seq(
      ("m1", "The Silent Horizon", "2", "thriller", "2001", "7.9"),
      ("m2", "Crimson Empire", null, "drama", "1999", "8.1"),
      ("m3", "Velvet Voyage", null, "comedy", "2005", "6.5"),
    )
    val v2 = Seq(
      ("m1", "The Silent Horizon", "2", "thriller", "2001", "8.0"), // volatile only
      ("m2", "Crimson Empire II", null, "drama", "1999", "8.1"),    // stable update
      ("m4", "Burning Harvest", null, "drama", "2021", "7.0"),      // added (m3 deleted)
    )
    (if (version == 0) base else v2)
      .toDF("movie_id", "title", "sequel_number", "category", "year", "score")
  }

  private def ratings() = Seq(("m1", "PG"), ("m2", "R"), ("m3", "PG"), ("m4", "PG"))
    .toDF("movie_id", "rating")

  private def pipeline(version: Int) = IngestPipeline(
    sourceName = "moviedb", trust = 0.8,
    importers = Seq(
      InMemoryImporter("movies", rawMovies(version)),
      InMemoryImporter("ratings", ratings())),
    primaryArtifact = "movies",
    idColumn = "movie_id",
    joins = Seq(("ratings", Seq("rating"))),
    alignment = Alignment.Config("movie", "movie_id", Seq(
      Alignment.Rename("title", "name"),
      Alignment.Rename("category", "genre"),
      Alignment.Rename("year", "release_year"),
      Alignment.Rename("rating", "rating"),
      Alignment.Rename("score", "box_office"), // stand-in volatile-ish metric
      Alignment.Combine(Seq("title", "sequel_number"), "full_title"))),
    volatilePreds = Set("box_office"),
  )

  test("bootstrap run: everything is Added, nothing Deleted/Updated") {
    val out = pipeline(0).run(spark, None)
    assert(out.violations.isEmpty)
    assert(out.added.select(Schema.Subject).distinct().count() == 3)
    assert(out.deleted.count() == 0 && out.updated.count() == 0)
  }

  test("export is in the KG ontology namespace with source-namespace subjects") {
    val out = pipeline(0).run(spark, None)
    val preds = out.added.select(Schema.Predicate).as[String].collect().toSet
    assert(preds.contains("genre") && !preds.contains("category"))
    val subs = out.added.select(Schema.Subject).as[String].collect().toSet
    assert(subs == Set("m1", "m2", "m3"))
  }

  test("secondary artifact columns are joined into the entity view") {
    val out = pipeline(0).run(spark, None)
    val rating = out.added.filter(col(Schema.Predicate) === "rating" &&
                                  col(Schema.Subject) === "m2")
    assert(rating.head().getAs[String](Schema.Obj) == "R")
  }

  test("volatile predicates land in the volatile dump, not the stable export") {
    val out = pipeline(0).run(spark, None)
    assert(out.added.filter(col(Schema.Predicate) === "box_office").count() == 0)
    assert(out.volatileDump.filter(col(Schema.Predicate) === "box_office").count() == 3)
  }

  test("second run against the snapshot computes correct deltas") {
    val run0 = pipeline(0).run(spark, None)
    val run1 = pipeline(1).run(spark, Some(run0.snapshot))
    val added = run1.added.select(Schema.Subject).as[String].collect().toSet
    val deleted = run1.deleted.select(Schema.Subject).as[String].collect().toSet
    val updated = run1.updated.select(Schema.Subject).as[String].collect().toSet
    assert(added == Set("m4"))
    assert(deleted == Set("m3"))
    assert(updated == Set("m2"))
  }

  test("volatile-only change does not produce an update") {
    val run0 = pipeline(0).run(spark, None)
    val run1 = pipeline(1).run(spark, Some(run0.snapshot))
    assert(!run1.updated.select(Schema.Subject).as[String].collect().contains("m1"))
    // but the new volatile value ships in the dump
    val m1Vol = run1.volatileDump.filter(col(Schema.Subject) === "m1" &&
      col(Schema.Predicate) === "box_office").head().getAs[String](Schema.Obj)
    assert(m1Vol == "8.0")
  }

  test("violations are reported, not thrown (quarantine semantics)") {
    val dupes = Seq(("m1", "A", null, "x", "2000", "1"), ("m1", "B", null, "y", "2001", "2"))
      .toDF("movie_id", "title", "sequel_number", "category", "year", "score")
    val p = pipeline(0).copy(importers = Seq(
      InMemoryImporter("movies", dupes), InMemoryImporter("ratings", ratings())))
    val out = p.run(spark, None)
    assert(out.violations.exists(_.check == "unique-ids"))
  }

  test("CSV importer template reads header files") {
    val dir = Files.createTempDirectory("csvimp").toFile
    val f = new java.io.File(dir, "part.csv")
    val w = new java.io.PrintWriter(f)
    w.println("movie_id,title"); w.println("m9,Test Movie"); w.close()
    val df = CsvImporter("movies", f.getAbsolutePath).importRows(spark)
    assert(df.columns.toSeq == Seq("movie_id", "title"))
    assert(df.count() == 1)
  }

  test("JSON importer template reads json-lines") {
    val dir = Files.createTempDirectory("jsonimp").toFile
    val f = new java.io.File(dir, "part.json")
    val w = new java.io.PrintWriter(f)
    w.println("""{"movie_id":"m9","title":"Test Movie"}"""); w.close()
    val df = JsonImporter("movies", f.getAbsolutePath).importRows(spark)
    assert(df.count() == 1)
    assert(df.select("title").head().getString(0) == "Test Movie")
  }

  test("Parquet importer roundtrips a written artifact") {
    val dir = Files.createTempDirectory("pqimp").resolve("data").toString
    rawMovies(0).write.parquet(dir)
    val df = ParquetImporter("movies", dir).importRows(spark)
    assert(df.count() == 3)
  }
}
