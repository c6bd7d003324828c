package repro.exp

import org.apache.spark.sql.SparkSession
import repro.SynthKG
import repro.engine.Importance
import repro.ml.Nerd

/** E4 (Figure 14a: text annotation) and E5 (Figure 14b: object
  * resolution): the NERD stack versus the deployed popularity/string
  * baseline that does not leverage the KG's relational information.
  */
object NerdExperiments {

  final case class PR(precision: Double, recall: Double, accepted: Int, total: Int)

  /** Score a disambiguator over labeled mentions at a confidence
    * threshold. A mention is accepted when confidence ≥ threshold;
    * precision = correct/accepted, recall = correct/total.
    */
  def evalPredictions(preds: Seq[(Option[Nerd.Prediction], String)], threshold: Double): PR = {
    val accepted = preds.collect { case (Some(p), truth) if p.confidence >= threshold => (p, truth) }
    val correct = accepted.count { case (p, truth) => p.id == truth }
    PR(
      precision = if (accepted.isEmpty) 1.0 else correct.toDouble / accepted.size,
      recall = if (preds.isEmpty) 0.0 else correct.toDouble / preds.size,
      accepted = accepted.size, total = preds.size)
  }

  /** Everything both experiments need: the entity view built by the Graph
    * Engine over the direct KG, the NERD index, and the baseline.
    */
  final case class Stack(u: SynthKG.Universe, index: Nerd.Index,
                         baseline: Nerd.PopularityBaseline) {
    def kgIdOf(trueId: String): String = KgBuilders.kgIdOf(trueId)
  }

  def buildStack(spark: SparkSession, scale: Int): Stack = {
    val u = SynthKG.universe(scale)
    val kg = repro.core.Dataflow.pin(KgBuilders.directKG(spark, u))
    val importance = Importance.importanceView(kg, prIterations = 6)
    val entries = Nerd.buildEntries(kg, importance)
    val encoder = KgBuilders.encoderFor(u)
    Stack(u, new Nerd.Index(entries, encoder), new Nerd.PopularityBaseline(entries))
  }

  // ------------------------------------------------------------------ E4

  final case class E4Row(threshold: Double, nerd: PR, base: PR) {
    def relRecallGain: Double =
      if (base.recall <= 1e-9) Double.PositiveInfinity else nerd.recall / base.recall - 1.0
    def relPrecisionGain: Double =
      if (base.precision <= 1e-9) 0.0 else nerd.precision / base.precision - 1.0
  }

  final case class E4Result(rows: Seq[E4Row], headRows: Seq[E4Row], tailRows: Seq[E4Row]) {
    def table: String = Table.render(
      "E4 / Figure 14a — NERD vs deployed baseline, text annotation " +
        "(paper: ~+70% recall at conf 0.9, diminishing at lower thresholds; precision +<=3.4% at >=0.8)",
      Seq("threshold", "NERD P", "NERD R", "base P", "base R", "ΔR rel", "ΔP rel"),
      rows.map(r => Seq(Table.f2(r.threshold),
        Table.pct(r.nerd.precision), Table.pct(r.nerd.recall),
        Table.pct(r.base.precision), Table.pct(r.base.recall),
        Table.pct(r.relRecallGain), Table.pct(r.relPrecisionGain))))
  }

  def runE4(spark: SparkSession, scale: Int, nMentions: Int = 1500,
            thresholds: Seq[Double] = Seq(0.5, 0.6, 0.7, 0.8, 0.9)): E4Result = {
    val stack = buildStack(spark, scale)
    val mentions = SynthKG.mentions(stack.u, nMentions)
    val nerdPreds = mentions.map(m =>
      (stack.index.disambiguate(m.surface, m.context), stack.kgIdOf(m.trueId)))
    val basePreds = mentions.map(m =>
      (stack.baseline.disambiguate(m.surface), stack.kgIdOf(m.trueId)))

    def rowsFor(sel: Seq[Boolean]): Seq[E4Row] = {
      val np = nerdPreds.zip(sel).collect { case (p, true) => p }
      val bp = basePreds.zip(sel).collect { case (p, true) => p }
      thresholds.map(t => E4Row(t, evalPredictions(np, t), evalPredictions(bp, t)))
    }
    val all = mentions.map(_ => true)
    val head = mentions.map(_.head)
    val tail = mentions.map(!_.head)
    E4Result(rowsFor(all), rowsFor(head), rowsFor(tail))
  }

  // ------------------------------------------------------------------ E5

  final case class E5Result(base: PR, nerd: PR, nerdTyped: PR, threshold: Double) {
    private def rel(x: Double, y: Double) = if (y <= 1e-9) 0.0 else x / y - 1.0
    def typedPrecisionGain: Double = rel(nerdTyped.precision, base.precision)
    def typedRecallGain: Double = rel(nerdTyped.recall, base.recall)
    def table: String = Table.render(
      s"E5 / Figure 14b — object resolution at confidence $threshold " +
        "(paper: NERD+type-hints ~+10% precision, ~+25% recall vs baseline)",
      Seq("system", "precision", "recall", "ΔP rel", "ΔR rel"),
      Seq(
        Seq("deployed baseline", Table.pct(base.precision), Table.pct(base.recall), "-", "-"),
        Seq("NERD", Table.pct(nerd.precision), Table.pct(nerd.recall),
            Table.pct(rel(nerd.precision, base.precision)), Table.pct(rel(nerd.recall, base.recall))),
        Seq("NERD + type hints", Table.pct(nerdTyped.precision), Table.pct(nerdTyped.recall),
            Table.pct(typedPrecisionGain), Table.pct(typedRecallGain))))
  }

  def runE5(spark: SparkSession, scale: Int, nRecords: Int = 1200,
            threshold: Double = 0.9): E5Result = {
    val stack = buildStack(spark, scale)
    val records = SynthKG.obrRecords(stack.u, nRecords)
    val base = records.map(r => (stack.baseline.disambiguate(r.value), stack.kgIdOf(r.trueId)))
    val nerd = records.map(r =>
      (stack.index.disambiguate(r.value, r.context), stack.kgIdOf(r.trueId)))
    val typed = records.map(r =>
      (stack.index.disambiguate(r.value, r.context, typeHint = Some(r.typeHint)),
       stack.kgIdOf(r.trueId)))
    E5Result(
      evalPredictions(base, threshold),
      evalPredictions(nerd, threshold),
      evalPredictions(typed, threshold),
      threshold)
  }
}
