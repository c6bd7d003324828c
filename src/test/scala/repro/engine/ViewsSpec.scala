package repro.engine

import org.apache.spark.sql.functions._
import repro.{SparkSpec, SynthKG}
import repro.exp.{KgBuilders, ViewExperiments}

/** KG views: catalog, dependency DAG, reuse, incremental update (§3.2). */
class ViewsSpec extends SparkSpec {
  import Views._

  private def countingView(name: String, deps: Seq[String] = Seq.empty,
                           counter: java.util.concurrent.atomic.AtomicInteger) =
    ViewDef(name, "analytics", deps, (spark, kg, depOut) => {
      counter.incrementAndGet()
      kg.select(col("subject").as("id")).distinct()
    })

  test("catalog rejects duplicate registrations") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("v", counter = n))
    intercept[IllegalArgumentException] { c.register(countingView("v", counter = n)) }
  }

  test("catalog rejects unknown dependencies") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    intercept[IllegalArgumentException] {
      c.register(countingView("v", deps = Seq("ghost"), counter = n))
    }
  }

  test("catalog refuses to drop a view with consumers") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("base", counter = n))
    c.register(countingView("child", deps = Seq("base"), counter = n))
    intercept[IllegalArgumentException] { c.drop("base") }
    c.drop("child")
    c.drop("base") // now fine
  }

  test("topoOrder puts dependencies before consumers") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("a", counter = n))
    c.register(countingView("b", deps = Seq("a"), counter = n))
    c.register(countingView("c", deps = Seq("b", "a"), counter = n))
    val order = c.topoOrder().map(_.name)
    assert(order.indexOf("a") < order.indexOf("b"))
    assert(order.indexOf("b") < order.indexOf("c"))
  }

  test("topoOrder with targets computes only the needed closure") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("a", counter = n))
    c.register(countingView("b", deps = Seq("a"), counter = n))
    c.register(countingView("lonely", counter = n))
    val order = c.topoOrder(Seq("b")).map(_.name)
    assert(order == Seq("a", "b"))
  }

  private lazy val kg = repro.core.Dataflow.pin(
    KgBuilders.directKG(spark, SynthKG.universe(4)))

  test("materializeAll with reuse computes each shared view once") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("features", counter = n))
    c.register(countingView("ranked", deps = Seq("features"), counter = n))
    c.register(countingView("neighborhood", deps = Seq("features"), counter = n))
    val mgr = new Manager(c)
    val rep = mgr.materializeAll(spark, kg, reuseShared = true)
    assert(rep.computeCounts("features") == 1)
    assert(rep.outputs.keySet == Set("features", "ranked", "neighborhood"))
  }

  test("materializeAll without reuse recomputes per consumer (E2 baseline)") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("features", counter = n))
    c.register(countingView("ranked", deps = Seq("features"), counter = n))
    c.register(countingView("neighborhood", deps = Seq("features"), counter = n))
    val rep = new Manager(c).materializeAll(spark, kg, reuseShared = false)
    // once per consumer + once as a root view
    assert(rep.computeCounts("features") == 3)
  }

  test("the Figure-7 production views materialize on a real KG") {
    val c = new Catalog
    ViewExperiments.registerFig7Views(c)
    val rep = new Manager(c).materializeAll(spark, kg)
    assert(rep.outputs("entity_features").count() > 0)
    assert(rep.outputs("ranked_entity_index").count() > 0)
    assert(rep.outputs("entity_neighborhood").count() > 0)
    // the ranked index carries capped, importance-ranked postings
    val row = rep.outputs("ranked_entity_index")
      .orderBy(desc("df")).select("topPostings").head()
    val postings = row.getSeq[org.apache.spark.sql.Row](0)
    assert(postings.nonEmpty && postings.size <= 20)
    val imps = postings.map(_.getDouble(0))
    assert(imps.zip(imps.tail).forall { case (a, b) => a >= b })
  }

  test("updateAll uses the incremental procedure when registered") {
    val c = new Catalog
    val incCalls = new java.util.concurrent.atomic.AtomicInteger()
    c.register(ViewDef("v", "analytics", Seq.empty,
      create = (s, k, d) => k.select(col("subject").as("id")).distinct(),
      update = Some((s, prev, k, d, changed) => { incCalls.incrementAndGet(); prev })))
    val mgr = new Manager(c)
    val first = mgr.materializeAll(spark, kg)
    import spark.implicits._
    val changed = Seq("kg:x").toDF("id")
    val out = mgr.updateAll(spark, kg, first.outputs, changed)
    assert(incCalls.get() == 1)
    assert(out.contains("v"))
  }

  test("updateAll recomputes views without an incremental procedure") {
    val c = new Catalog
    val n = new java.util.concurrent.atomic.AtomicInteger()
    c.register(countingView("v", counter = n))
    val mgr = new Manager(c)
    val first = mgr.materializeAll(spark, kg)
    import spark.implicits._
    mgr.updateAll(spark, kg, first.outputs, Seq("kg:x").toDF("id"))
    assert(n.get() == 2)
  }
}
