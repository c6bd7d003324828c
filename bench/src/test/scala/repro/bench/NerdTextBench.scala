package repro.bench

import repro.SparkSpec
import repro.exp.NerdExperiments

/** E4 / Figure 14a — NERD vs the deployed popularity/string baseline on
  * text annotation. Paper: ~+70% relative recall at confidence 0.9,
  * gains diminishing at lower thresholds; precision gains up to +3.4% at
  * thresholds ≥ 0.8.
  */
class NerdTextBench extends SparkSpec {

  test("E4: NERD's relational context wins on recall at high confidence") {
    val res = NerdExperiments.runE4(spark, scale = 250, nMentions = 1500)
    println(res.table)

    val at09 = res.rows.find(_.threshold == 0.9).get
    val at05 = res.rows.find(_.threshold == 0.5).get

    // big relative recall gain at the 0.9 operating point (paper: ~70%)
    assert(at09.relRecallGain > 0.25,
      f"recall gain at 0.9 = ${at09.relRecallGain * 100}%.1f%% — paper: ~70%%")
    // gains diminish at lower thresholds (paper: 'naturally diminish')
    assert(at09.relRecallGain > at05.relRecallGain,
      f"gain at 0.9 (${at09.relRecallGain}%.2f) should exceed gain at 0.5 (${at05.relRecallGain}%.2f)")
    // precision at high confidence: NERD does not lose (paper: up to +3.4%)
    assert(at09.nerd.precision >= at09.base.precision - 0.02,
      f"NERD precision ${at09.nerd.precision}%.3f vs baseline ${at09.base.precision}%.3f")
    // the tail is where the gain comes from
    val tail09 = res.tailRows.find(_.threshold == 0.9).get
    val head09 = res.headRows.find(_.threshold == 0.9).get
    assert(tail09.relRecallGain > head09.relRecallGain,
      "NERD's advantage must concentrate on tail entities")
  }
}
