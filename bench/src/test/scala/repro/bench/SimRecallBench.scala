package repro.bench

import repro.SparkSpec
import repro.exp.SimRecallExperiment

/** E6 / §5.1 — learned string similarities for duplicate detection under
  * typos and synonyms. Paper: recall improvements of more than 20 points
  * while precision holds.
  */
class SimRecallBench extends SparkSpec {

  test("E6: the learned-similarity feature adds >20 recall points at the linking threshold") {
    val res = SimRecallExperiment.run(spark, scale = 200)
    println(res.table)

    assert(res.recallGain > 0.20,
      f"recall gain ${res.recallGain * 100}%.1f points — paper: >20 points")
    // the operating point stays high-precision for both matchers
    assert(res.deterministic.precision > 0.9,
      f"deterministic precision ${res.deterministic.precision}%.3f")
    assert(res.learned.precision > 0.9,
      f"learned precision ${res.learned.precision}%.3f")
  }
}
