package repro.live

import repro.core.Ontology
import repro.ml.{Nerd, StringSim}
import Stores.Record

/** Query intent handling and multi-turn context (§4.2).
  *
  * Intents are routed to the correct graph query using the semantics
  * encoded in the KG: `HeadOfState(Canada)` resolves to the
  * `prime_minister` predicate because the argument is a country, while
  * `HeadOfState(Chicago)` resolves to `mayor` because it is a city —
  * only one interpretation is meaningful per entity type.
  *
  * The engine maintains a context graph of previous intents and answers,
  * so follow-ups can rebind either the intent ("How about Tom Hanks?" —
  * previous intent, new argument) or the argument ("Where is she from?"
  * — new intent, argument pulled from the previous answer).
  */
object Intents {

  final case class IntentResult(intent: String, argumentId: String,
                                predicate: String, answers: Seq[String],
                                answerIds: Seq[String])

  final class Engine(live: LiveGraph, er: Nerd.Index) {

    /** The context graph: previous (intent, argument, answers). */
    private var lastIntent: Option[String] = None
    private var lastAnswerIds: Seq[String] = Seq.empty

    private def displayOf(id: String): String =
      live.kv.get(id).flatMap(_.get("name")).flatMap(_.headOption).getOrElse(id)

    private def typeOf(id: String): Option[String] =
      live.kv.get(id).flatMap(_.get("type")).flatMap(_.headOption)

    private def resolveArg(surface: String): Option[String] =
      er.disambiguate(surface, Seq.empty, None).filter(_.confidence >= 0.5).map(_.id)

    /** Handle an intent with an entity argument given by surface form. */
    def handle(intent: String, argSurface: String): Option[IntentResult] =
      resolveArg(argSurface).flatMap(handleResolved(intent, _))

    /** Handle an intent whose argument is already an entity id. */
    def handleResolved(intent: String, argId: String): Option[IntentResult] =
      for {
        argType <- typeOf(argId)
        pred <- Ontology.resolveIntent(intent, argType)
        rec <- live.kv.get(argId)
      } yield {
        val vals = rec.getOrElse(pred, Seq.empty)
        val (ids, lits) = vals.partition(v => v.startsWith("kg:") || v.startsWith("live:"))
        val answers = lits ++ ids.map(displayOf)
        lastIntent = Some(intent)
        lastAnswerIds = if (ids.nonEmpty) ids else Seq(argId)
        IntentResult(intent, argId, pred, answers, ids)
      }

    /** "How about X?" — reuse the previous intent with a new argument. */
    def followUpNewArg(argSurface: String): Option[IntentResult] =
      lastIntent.flatMap(handle(_, argSurface))

    /** "Where is she from?" — new intent, argument bound from the
      * previous answer in the context graph.
      */
    def followUpNewIntent(intent: String): Option[IntentResult] =
      lastAnswerIds.headOption.flatMap(handleResolved(intent, _))

    /** A small utterance front-end covering the paper's example dialogue
      * patterns; production systems put a full NLU stack here.
      */
    def utterance(text: String): Option[IntentResult] = {
      val t = StringSim.normalize(text)
      val patterns: Seq[(String, String => Option[IntentResult])] = Seq(
        "who is the leader of "  -> (arg => handle("HeadOfState", arg)),
        "who is " -> { arg =>
          if (arg.endsWith(" married to")) handle("SpouseOf", arg.stripSuffix(" married to"))
          else None
        },
        "how about " -> (arg => followUpNewArg(arg)),
        "where is she from" -> (_ => followUpNewIntent("Birthplace")),
        "where is he from"  -> (_ => followUpNewIntent("Birthplace")),
        "how old is " -> (arg => handle("AgeOf", arg)),
      )
      patterns.collectFirst {
        case (prefix, f) if t.startsWith(prefix.trim) =>
          f(t.stripPrefix(prefix.trim).trim)
      }.flatten
    }
  }
}
