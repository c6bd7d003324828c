package repro.bench

import repro.SparkSpec
import repro.exp.NerdExperiments

/** E5 / Figure 14b — object resolution at confidence 0.9: deployed
  * baseline vs NERD vs NERD with explicit type hints. Paper: type hints
  * give ~+10% precision and ~+25% recall over the baseline.
  */
class NerdObrBench extends SparkSpec {

  test("E5: NERD + type hints beats the baseline on both precision and recall") {
    val res = NerdExperiments.runE5(spark, scale = 250, nRecords = 1200, threshold = 0.9)
    println(res.table)

    // type hints improve precision over the baseline (paper: ~+10%)
    assert(res.typedPrecisionGain > 0.0,
      f"typed precision gain ${res.typedPrecisionGain * 100}%.1f%%")
    // and recall substantially (paper: ~+25%)
    assert(res.typedRecallGain > 0.10,
      f"typed recall gain ${res.typedRecallGain * 100}%.1f%% — paper: ~25%%")
    // type hints refine plain NERD precision (the Figure-14b ordering)
    assert(res.nerdTyped.precision >= res.nerd.precision - 0.01)
    // all three systems are evaluated on the same records at 0.9
    assert(res.base.total == res.nerd.total && res.nerd.total == res.nerdTyped.total)
  }
}
