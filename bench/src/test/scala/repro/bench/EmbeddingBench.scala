package repro.bench

import repro.SparkSpec
import repro.exp.EmbeddingExperiment

/** E9 / §5.3 — KG embeddings unify fact ranking, verification and
  * imputation. Functional validation: corrupted facts are separable and
  * held-out facts are recoverable via Vector-DB search, for both TransE
  * and DistMult under the same training architecture.
  */
class EmbeddingBench extends SparkSpec {

  test("E9: both embedding models verify and impute facts usefully") {
    val res = EmbeddingExperiment.run(spark, scale = 50, heldOut = 150)
    println(res.table)

    res.models.foreach { m =>
      assert(m.aucLike > 0.7, f"${m.kind} corrupt-vs-true AUC ${m.aucLike}%.2f")
      assert(m.hitAt5 > 0.10, f"${m.kind} imputation hit@5 ${m.hitAt5 * 100}%.1f%%")
      assert(m.mrr > 0.05, f"${m.kind} MRR ${m.mrr}%.2f")
    }
    assert(res.models.map(_.kind).toSet == Set("TransE", "DistMult"))
  }
}
