package repro.ingest

import org.apache.spark.sql.functions._
import repro.SparkSpec

/** Data Transformer integrity checks (§2.2). */
class EntityTransformSpec extends SparkSpec {
  import spark.implicits._

  test("entityView joins secondary artifacts on the id column") {
    val artists = Seq(("a1", "Alpha"), ("a2", "Beta")).toDF("artist_id", "artist_name")
    val pop = Seq(("a1", 0.9)).toDF("artist_id", "pop")
    val v = EntityTransform.entityView(artists, "artist_id", Seq((pop, Seq("pop"))))
    val rows = v.orderBy("artist_id").collect()
    assert(rows(0).getAs[Double]("pop") == 0.9)
    assert(rows(1).isNullAt(rows(1).fieldIndex("pop"))) // left join keeps a2
  }

  test("entityView without secondaries is the primary") {
    val p = Seq(("a", "x")).toDF("id", "v")
    assert(EntityTransform.entityView(p, "id").collect().length == 1)
  }

  test("check passes a clean payload") {
    val v = Seq(("a1", "x"), ("a2", "y")).toDF("id", "v")
    assert(EntityTransform.check(v, "id", Seq("id", "v")).isEmpty)
  }

  test("check flags duplicate entity ids") {
    val v = Seq(("a1", "x"), ("a1", "y")).toDF("id", "v")
    val vs = EntityTransform.check(v, "id", Seq("id", "v"))
    assert(vs.exists(_.check == "unique-ids"))
  }

  test("check flags null and blank ids") {
    val v = Seq((null: String, "x"), ("  ", "y")).toDF("id", "v")
    val vs = EntityTransform.check(v, "id", Seq("id", "v"))
    assert(vs.exists(_.check == "id-predicate"))
  }

  test("check flags a missing id column") {
    val v = Seq(("x", "y")).toDF("a", "b")
    val vs = EntityTransform.check(v, "id", Seq("a", "b"))
    assert(vs.exists(_.check == "id-predicate"))
  }

  test("check flags source-schema predicates absent from the view") {
    val v = Seq(("a1", "x")).toDF("id", "v")
    val vs = EntityTransform.check(v, "id", Seq("id", "v", "missing_pred"))
    assert(vs.exists(_.check == "schema-complete"))
  }

  test("schema-complete is satisfied by an all-null column") {
    val v = Seq(("a1", "x")).toDF("id", "v").withColumn("rating", lit(null: String))
    assert(EntityTransform.check(v, "id", Seq("id", "v", "rating")).isEmpty)
  }

  test("validate throws on violations, passes clean payloads through") {
    val bad = Seq(("a1", "x"), ("a1", "y")).toDF("id", "v")
    intercept[IllegalArgumentException] { EntityTransform.validate(bad, "id", Seq("id", "v")) }
    val good = Seq(("a1", "x")).toDF("id", "v")
    assert(EntityTransform.validate(good, "id", Seq("id", "v")).count() == 1)
  }

  test("trimStrings trims only string columns") {
    val v = Seq(("  a1 ", 3)).toDF("id", "n")
    val row = EntityTransform.trimStrings(v).head()
    assert(row.getString(0) == "a1")
    assert(row.getInt(1) == 3)
  }

  test("integrity checks catch several violations at once") {
    val v = Seq(("a1", "x"), ("a1", "y"), (null: String, "z")).toDF("id", "v")
    val vs = EntityTransform.check(v, "id", Seq("id", "v", "ghost"))
    assert(vs.map(_.check).toSet == Set("unique-ids", "id-predicate", "schema-complete"))
  }
}
