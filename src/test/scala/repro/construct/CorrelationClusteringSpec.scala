package repro.construct

import org.scalacheck.{Gen, Prop}
import repro.{Props, SparkSpec}
import CorrelationClustering._

/** Resolution via correlation clustering (§2.3 step 5). */
class CorrelationClusteringSpec extends SparkSpec {

  // ------------------------------------------------------------- local
  test("clusterLocal merges a positive clique") {
    val nodes = Seq("a", "b", "c")
    val edges = Seq(Edge("a", "b", 1, 0.9), Edge("b", "c", 1, 0.9), Edge("a", "c", 1, 0.9))
    val asg = clusterLocal(nodes, edges, 1)
    assert(asg.values.toSet.size == 1)
  }

  test("clusterLocal keeps negative pairs apart") {
    val nodes = Seq("a", "b")
    val asg = clusterLocal(nodes, Seq(Edge("a", "b", -1, 0.1)), 1)
    assert(asg("a") != asg("b"))
  }

  test("clusterLocal: negative edge to pivot blocks absorption even with a positive edge") {
    val nodes = Seq("a", "b")
    val edges = Seq(Edge("a", "b", 1, 0.9), Edge("a", "b", -1, 0.1))
    val asg = clusterLocal(nodes, edges, 7)
    assert(asg("a") != asg("b"))
  }

  test("clusterLocal assigns every node") {
    val nodes = Seq("a", "b", "c", "d", "e")
    val edges = Seq(Edge("a", "b", 1, 0.9))
    val asg = clusterLocal(nodes, edges, 3)
    assert(asg.keySet == nodes.toSet)
  }

  test("clusterLocal singleton graph") {
    assert(clusterLocal(Seq("x"), Seq.empty, 1) == Map("x" -> "x"))
  }

  test("clusterLocal is deterministic in the seed") {
    val nodes = (1 to 20).map(i => s"n$i")
    val edges = (1 until 20).map(i => Edge(s"n$i", s"n${i + 1}", if (i % 3 == 0) -1 else 1, 0.9))
    assert(clusterLocal(nodes, edges, 5) == clusterLocal(nodes, edges, 5))
  }

  test("clusterLocal cost never exceeds the trivial all-singletons cost (property)") {
    val nodeGen = Gen.choose(2, 12)
    Props.check(Prop.forAll(nodeGen, Gen.long) { (n, seed) =>
      val nodes = (0 until n).map(i => s"v$i")
      val rnd = new scala.util.Random(seed)
      val edges = for {
        i <- 0 until n; j <- (i + 1) until n if rnd.nextDouble() < 0.4
      } yield Edge(s"v$i", s"v$j", if (rnd.nextBoolean()) 1 else -1, 0.5)
      val asg = clusterLocal(nodes, edges, seed)
      val singletons = nodes.map(x => x -> x).toMap
      cost(edges, asg) <= cost(edges, singletons)
    }, minTests = 40)
  }

  test("cost counts cut positives and kept negatives") {
    val edges = Seq(Edge("a", "b", 1, 0.9), Edge("a", "c", -1, 0.1))
    val together = Map("a" -> "a", "b" -> "a", "c" -> "a")
    assert(cost(edges, together) == 1) // negative kept inside
    val apart = Map("a" -> "a", "b" -> "b", "c" -> "c")
    assert(cost(edges, apart) == 1) // positive cut
  }

  // ---------------------------------------------------------- distributed
  import spark.implicits._

  test("connectedComponents groups a chain into one component") {
    val nodes = Seq("a", "b", "c", "d").toDF("id")
    val pos = Seq(("a", "b"), ("b", "c"), ("c", "d")).toDF("a", "b")
    val comps = connectedComponents(nodes, pos)
    assert(comps.select("comp").distinct().count() == 1)
  }

  test("connectedComponents keeps disconnected nodes separate") {
    val nodes = Seq("a", "b", "c").toDF("id")
    val pos = Seq(("a", "b")).toDF("a", "b")
    val comps = connectedComponents(nodes, pos).collect().map(r => r.getString(0) -> r.getString(1)).toMap
    assert(comps("a") == comps("b"))
    assert(comps("c") != comps("a"))
  }

  test("connectedComponents with no edges yields identity labels") {
    val nodes = Seq("x", "y").toDF("id")
    val pos = Seq.empty[(String, String)].toDF("a", "b")
    val comps = connectedComponents(nodes, pos).collect().map(r => r.getString(0) -> r.getString(1)).toMap
    assert(comps == Map("x" -> "x", "y" -> "y"))
  }

  test("distributed cluster matches expected merge structure") {
    val nodes = Seq("s1", "s2", "k1", "z").toDF("id")
    val edges = Seq(
      ("s1", "s2", 1, 0.95), ("s1", "k1", 1, 0.92), ("s2", "k1", 1, 0.91),
    ).toDF("a", "b", "sign", "score")
    val asg = cluster(nodes, edges, seed = 3).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    assert(asg("s1") == asg("s2") && asg("s2") == asg("k1"))
    assert(asg("z") != asg("s1"))
    assert(asg.keySet == Set("s1", "s2", "k1", "z"))
  }

  test("distributed cluster honours negative edges between pivot and neighbour") {
    val nodes = Seq("a", "b").toDF("id")
    // the pair is simultaneously +linked and −linked; the − edge vetoes
    // absorption regardless of which endpoint pivots
    val edges = Seq(
      ("a", "b", 1, 0.9), ("a", "b", -1, 0.05),
    ).toDF("a", "b", "sign", "score")
    val asg = cluster(nodes, edges, seed = 11).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    assert(asg("a") != asg("b"))
  }

  test("distributed triangle with one negative edge pays the minimum disagreement") {
    val nodes = Seq("a", "b", "c").toDF("id")
    val es = Seq(("a", "b", 1, 0.9), ("b", "c", 1, 0.9), ("a", "c", -1, 0.05))
    val asg = cluster(nodes, es.toDF("a", "b", "sign", "score"), seed = 11).collect()
      .map(r => r.getString(0) -> r.getString(1)).toMap
    val edgeObjs = es.map { case (x, y, s, sc) => Edge(x, y, s, sc) }
    // any optimal assignment of this triangle has cost exactly 1
    assert(cost(edgeObjs, asg) == 1, asg.toString)
  }

  test("distributed cluster covers all nodes even isolated ones") {
    val nodes = Seq("p", "q", "r").toDF("id")
    val edges = Seq(("p", "q", 1, 0.9)).toDF("a", "b", "sign", "score")
    val asg = cluster(nodes, edges, seed = 1).collect().map(_.getString(0)).toSet
    assert(asg == Set("p", "q", "r"))
  }
}
