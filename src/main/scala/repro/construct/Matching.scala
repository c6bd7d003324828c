package repro.construct

import repro.core.Ontology
import repro.ml.StringSim
import repro.ml.StringSim.LearnedEncoder

/** Matching models (§2.3 step 4): given a candidate pair of entity
  * records, emit a *calibrated probability* of being the same real-world
  * entity. The platform supports both rule-based and ML-driven models; a
  * library of deterministic and learned similarity functions featurizes
  * the pair.
  */
object Matching {

  /** An entity record as seen by linking: the entity-centric consolidation
    * of its extended triples. `isKg` marks records from the current KG
    * view (linking targets) as opposed to incoming source records.
    */
  final case class Rec(
      id: String,
      etype: String,
      name: String,
      aliases: Seq[String],
      attrs: Map[String, String],
      isKg: Boolean,
  ) {
    def allNames: Seq[String] = (name +: Option(aliases).getOrElse(Seq.empty)).filter(_ != null)
  }

  /** Pair feature vector. Order matters — it is the contract with the
    * logistic model weights.
    */
  final case class Features(
      bestEditSim: Double,      // best edit similarity across name/alias pairs
      bestQgramSim: Double,     // best q-gram Jaccard across name/alias pairs
      tokenJaccard: Double,     // token Jaccard of primary names
      learnedSim: Double,       // best learned (synonym-aware) similarity
      attrAgree: Double,        // fraction of shared evidence attrs that agree
      attrConflict: Double,     // fraction of shared evidence attrs that conflict
      sharedAttrs: Double,      // how much evidence was available, in [0,1]
  ) {
    def toArray: Array[Double] =
      Array(bestEditSim, bestQgramSim, tokenJaccard, learnedSim, attrAgree, attrConflict, sharedAttrs)
  }

  /** Featurize a pair. The learned encoder is optional: models built
    * before an encoder is trained (or for types without one) fall back to
    * deterministic similarity only — exactly the ablation that E6
    * (SimRecallBench) measures.
    */
  def features(a: Rec, b: Rec, encoder: Option[LearnedEncoder]): Features = {
    val pairs = for (x <- a.allNames; y <- b.allNames) yield (x, y)
    val bestEdit = if (pairs.isEmpty) 0.0 else pairs.map { case (x, y) => StringSim.editSim(x, y) }.max
    val bestQgram = if (pairs.isEmpty) 0.0 else pairs.map { case (x, y) => StringSim.qgramJaccard(x, y) }.max
    val tokJ = StringSim.jaccard(a.name, b.name)
    val learned = encoder match {
      case Some(enc) if pairs.nonEmpty => pairs.map { case (x, y) => enc.sim(x, y) }.max
      case _ => bestQgram // fall back to the deterministic typo-tolerant sim
    }
    val evid = Ontology.matchEvidencePredicates.getOrElse(a.etype, Seq.empty)
    val shared = evid.filter(p => a.attrs.contains(p) && b.attrs.contains(p))
    val agree = shared.count(p => StringSim.normalize(a.attrs(p)) == StringSim.normalize(b.attrs(p)))
    val conflict = shared.size - agree
    Features(
      bestEdit, bestQgram, tokJ, learned,
      if (shared.isEmpty) 0.0 else agree.toDouble / shared.size,
      if (shared.isEmpty) 0.0 else conflict.toDouble / shared.size,
      math.min(1.0, shared.size / 3.0),
    )
  }

  /** A matching model: calibrated match probability for a record pair. */
  trait Model extends Serializable {
    def prob(a: Rec, b: Rec): Double
  }

  /** Logistic matcher over the pair features — the "machine learning-based
    * matching model" flavour. Default weights are hand-calibrated to the
    * feature semantics; [[trainLogistic]] fits them from labeled pairs.
    */
  final case class LogisticModel(weights: Array[Double], bias: Double,
                                 encoder: Option[LearnedEncoder]) extends Model {
    require(weights.length == 7, "weight per feature")
    def prob(a: Rec, b: Rec): Double = {
      if (a.etype != b.etype) return 0.0
      val f = features(a, b, encoder).toArray
      val z = bias + f.zip(weights).map { case (x, w) => x * w }.sum
      1.0 / (1.0 + math.exp(-z))
    }
  }

  /** Sensible default: strong weight on name evidence, learned similarity
    * contributes recall, attribute conflicts veto.
    */
  def defaultModel(encoder: Option[LearnedEncoder]): LogisticModel =
    LogisticModel(Array(5.0, 3.0, 1.5, 4.0, 2.5, -6.0, 0.5), bias = -7.0, encoder)

  /** Rule-based matcher (NADEEF/ER-style): exact high-precision rules with
    * an explicit probability ladder.
    */
  final case class RuleModel(encoder: Option[LearnedEncoder]) extends Model {
    def prob(a: Rec, b: Rec): Double = {
      if (a.etype != b.etype) return 0.0
      val f = features(a, b, encoder)
      if (f.attrConflict > 0.51) 0.02
      else if (f.bestEditSim >= 0.97 && f.attrConflict == 0.0) 0.98
      else if (f.learnedSim >= 0.92 && f.attrAgree >= 0.5) 0.95
      else if (f.bestQgramSim >= 0.80 && f.attrAgree > 0.0) 0.90
      else if (f.bestEditSim >= 0.90) 0.75
      else 0.05
    }
  }

  /** Fit logistic weights by gradient descent on labeled pairs. Small and
    * deterministic — matching models are per-entity-type and trained on
    * thousands, not billions, of labeled pairs.
    */
  def trainLogistic(labeled: Seq[(Rec, Rec, Boolean)], encoder: Option[LearnedEncoder],
                    epochs: Int = 200, lr: Double = 0.5): LogisticModel = {
    val feats = labeled.map { case (a, b, y) => (features(a, b, encoder).toArray, if (y) 1.0 else 0.0) }
    val w = Array.fill(7)(0.0)
    var bias = 0.0
    for (_ <- 0 until epochs; (f, y) <- feats) {
      val z = bias + f.zip(w).map { case (x, wi) => x * wi }.sum
      val p = 1.0 / (1.0 + math.exp(-z))
      val g = p - y
      var i = 0
      while (i < 7) { w(i) -= lr * g * f(i); i += 1 }
      bias -= lr * g
    }
    LogisticModel(w, bias, encoder)
  }
}
