package repro.live

import org.scalatest.funsuite.AnyFunSuite
import Stores._

/** Live serving stores: sharded KV store + inverted index (§4.1). */
class StoresSpec extends AnyFunSuite {

  test("kv put/get roundtrip") {
    val kv = new KVStore(4)
    kv.put("a", Map("name" -> Seq("X")))
    assert(kv.get("a").contains(Map("name" -> Seq("X"))))
  }

  test("kv get of a missing id is None") {
    assert(new KVStore(4).get("nope").isEmpty)
  }

  test("kv delete removes the record") {
    val kv = new KVStore(4)
    kv.put("a", Map("name" -> Seq("X")))
    kv.delete("a")
    assert(kv.get("a").isEmpty)
  }

  test("kv size and ids span shards") {
    val kv = new KVStore(4)
    (1 to 50).foreach(i => kv.put(s"id$i", Map("n" -> Seq(i.toString))))
    assert(kv.size == 50)
    assert(kv.ids.toSet == (1 to 50).map(i => s"id$i").toSet)
  }

  test("kv update transforms in place and ignores missing ids") {
    val kv = new KVStore(2)
    kv.put("a", Map("v" -> Seq("1")))
    kv.update("a")(r => r.updated("v", Seq("2")))
    kv.update("ghost")(r => r)
    assert(kv.get("a").get("v") == Seq("2"))
  }

  test("kv is safe under concurrent writers") {
    val kv = new KVStore(8)
    val threads = (0 until 8).map { t =>
      new Thread(() => (0 until 500).foreach(i => kv.put(s"k-$t-$i", Map("x" -> Seq("1")))))
    }
    threads.foreach(_.start()); threads.foreach(_.join())
    assert(kv.size == 4000)
  }

  test("index lookup finds ids by token") {
    val idx = new InvertedIndex(4)
    idx.index("e1", "name", "Tom Hanks")
    idx.index("e2", "name", "Tom Baker")
    assert(idx.lookup("tom") == Set("e1", "e2"))
    assert(idx.lookup("hanks") == Set("e1"))
  }

  test("index lookup intersects multi-token queries") {
    val idx = new InvertedIndex(4)
    idx.index("e1", "name", "Tom Hanks")
    idx.index("e2", "name", "Tom Baker")
    assert(idx.lookup("tom hanks") == Set("e1"))
  }

  test("index lookup can be restricted to a field") {
    val idx = new InvertedIndex(4)
    idx.index("e1", "name", "salem")
    idx.index("e2", "birthplace", "salem")
    assert(idx.lookup("salem", Some("name")) == Set("e1"))
    assert(idx.lookup("salem") == Set("e1", "e2"))
  }

  test("index lookup is normalization-insensitive") {
    val idx = new InvertedIndex(4)
    idx.index("e1", "name", "Tom Hanks")
    assert(idx.lookup("TOM  HANKS!") == Set("e1"))
  }

  test("index remove drops all postings of an id") {
    val idx = new InvertedIndex(4)
    idx.index("e1", "name", "Tom Hanks")
    idx.index("e2", "name", "Tom Baker")
    idx.remove("e1")
    assert(idx.lookup("tom") == Set("e2"))
    assert(idx.lookup("hanks").isEmpty)
  }

  test("indexRecord indexes every field and value") {
    val idx = new InvertedIndex(4)
    idx.indexRecord("e1", Map("name" -> Seq("Alpha Beta"), "alias" -> Seq("Gamma")))
    assert(idx.lookup("alpha") == Set("e1"))
    assert(idx.lookup("gamma", Some("alias")) == Set("e1"))
  }

  test("lookup of an empty string is empty") {
    assert(new InvertedIndex(2).lookup("") == Set.empty)
  }
}
