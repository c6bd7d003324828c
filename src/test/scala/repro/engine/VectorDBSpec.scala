package repro.engine

import org.scalatest.funsuite.AnyFunSuite

/** Vector DB store: exact cosine top-k with attribute filters (§3.2). */
class VectorDBSpec extends AnyFunSuite {

  private def db(): VectorDB = {
    val v = new VectorDB
    v.upsert("a", Array(1.0, 0.0), Map("type" -> "person"))
    v.upsert("b", Array(0.9, 0.1), Map("type" -> "person"))
    v.upsert("c", Array(0.0, 1.0), Map("type" -> "city"))
    v
  }

  test("knn returns nearest by cosine first") {
    val res = db().knn(Array(1.0, 0.0), 2)
    assert(res.map(_._1) == Seq("a", "b"))
  }

  test("knn scores are descending and within [-1,1]") {
    val res = db().knn(Array(0.5, 0.5), 3)
    assert(res.map(_._2) == res.map(_._2).sorted.reverse)
    assert(res.forall { case (_, s) => s >= -1.0001 && s <= 1.0001 })
  }

  test("attribute filter restricts the candidate set (Figure 7 'people' subset)") {
    val res = db().knn(Array(0.0, 1.0), 3, Some("type" -> "person"))
    assert(res.map(_._1).toSet == Set("a", "b"))
  }

  test("filter with no matches yields empty") {
    assert(db().knn(Array(1.0, 0.0), 3, Some("type" -> "school")).isEmpty)
  }

  test("k truncates results") {
    assert(db().knn(Array(1.0, 0.0), 1).size == 1)
  }

  test("upsert replaces an existing vector") {
    val v = db()
    v.upsert("a", Array(0.0, 1.0), Map("type" -> "person"))
    assert(v.knn(Array(0.0, 1.0), 1).head._1 == "a" ||
           v.knn(Array(0.0, 1.0), 1).head._1 == "c") // both are now colinear
    assert(v.get("a").get.vector.toSeq == Seq(0.0, 1.0))
  }

  test("delete removes an entry") {
    val v = db()
    v.delete("a")
    assert(v.size == 2)
    assert(v.get("a").isEmpty)
  }

  test("deterministic tie-breaking by id") {
    val v = new VectorDB
    v.upsert("z", Array(1.0, 0.0))
    v.upsert("y", Array(1.0, 0.0))
    assert(v.knn(Array(1.0, 0.0), 2).map(_._1) == Seq("y", "z"))
  }

  test("empty store yields empty knn") {
    assert(new VectorDB().knn(Array(1.0), 5).isEmpty)
  }
}
