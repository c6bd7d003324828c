package repro.bench

import repro.SparkSpec
import repro.exp.ViewExperiments

/** E1 / Figure 8 — schematized entity view computation: Analytics Store
  * (shared pivot) vs legacy per-view Spark jobs. Paper: average 5×
  * speedup, max 14×, minimum +5% (Songs), no view regresses.
  */
class ViewComputeBench extends SparkSpec {

  test("E1: analytics-store views beat legacy Spark jobs; the narrow Songs view gains least") {
    // scale large enough that scan+join work dominates per-job scheduling
    // overhead — at small inputs both paths cost one Spark-job latency
    // and the ratios compress toward 1.
    val res = ViewExperiments.runE1(spark, scale = 2500, repeats = 2)
    println(res.table)

    // Shape of Figure 8:
    assert(res.avgSpeedup > 2.0, f"avg speedup ${res.avgSpeedup}%.2f — paper: ~5x")
    assert(res.maxSpeedup > 4.0, f"max speedup ${res.maxSpeedup}%.2f — paper: up to 14x")
    // no view regresses (small timing noise tolerated)
    assert(res.minSpeedup > 0.9, f"min speedup ${res.minSpeedup}%.2f — paper: no regressions")
    // narrow views gain the least (the paper's Songs case was +5%): the
    // 2-predicate songs view sits below the average, and the join-heavy
    // person view (14 predicates incl. one-hop columns) beats it clearly
    val songs = res.rows.find(_.entityType == "song").get
    val person = res.rows.find(_.entityType == "person").get
    assert(songs.speedup < res.avgSpeedup,
      f"songs speedup ${songs.speedup}%.2f should trail the average ${res.avgSpeedup}%.2f")
    assert(person.speedup > songs.speedup,
      f"join-heavy person (${person.speedup}%.2fx) must gain more than narrow songs (${songs.speedup}%.2fx)")
  }
}
