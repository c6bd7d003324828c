package repro.bench

import repro.SparkSpec
import repro.exp.GrowthExperiment

/** E3 / Figure 12 — relative KG growth with Saga introduced mid-series.
  * Paper: >33× facts, 6.5× entities since the initial measurement, with
  * growth accelerating at Saga's introduction.
  */
class GrowthBench extends SparkSpec {

  test("E3: facts grow much faster than entities, inflecting at the Saga quarter") {
    val res = GrowthExperiment.run(spark, scale = 20, quarters = 10, sagaQuarter = 3)
    println(res.table)

    val pre = res.stats(res.sagaQuarter - 1)
    val fin = res.stats.last

    // growth happened at all
    assert(fin.factsRel > 1.0 && fin.entitiesRel > 1.0)
    // facts outgrow entities by a clear factor (paper: 33x vs 6.5x ≈ 5:1)
    assert(fin.factsRel > 2.0 * fin.entitiesRel,
      f"facts ${fin.factsRel}%.1fx vs entities ${fin.entitiesRel}%.1fx — paper ratio ~5:1")
    // substantial absolute multiples
    assert(fin.factsRel > 8.0, f"facts grew ${fin.factsRel}%.1fx — paper: 33x")
    assert(fin.entitiesRel > 2.0, f"entities grew ${fin.entitiesRel}%.1fx — paper: 6.5x")
    // the Saga introduction is the inflection: post-Saga growth dominates
    assert(fin.factsRel / pre.factsRel > 2.0,
      f"post-Saga fact growth ${fin.factsRel / pre.factsRel}%.1fx over the pre-Saga level")
    // monotone non-decreasing entity counts (the KG never loses entities here)
    val ents = res.stats.map(_.entities)
    assert(ents.zip(ents.tail).forall { case (a, b) => b >= a })
  }
}
