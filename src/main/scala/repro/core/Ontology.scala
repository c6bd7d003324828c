package repro.core

/** The in-house open-domain ontology (§2): entity types, their predicates,
  * composite (relationship) predicates, volatile predicates, and the
  * semantics used by intent routing (§4.2) and object resolution (§2.3).
  *
  * This is deliberately small but structurally faithful: multiple verticals
  * (people, music, movies, sports, geography), composite relationships with
  * relationship predicates, entity-reference predicates whose objects must
  * be resolved against the KG, and high-churn volatile predicates that are
  * fused via partition overwrite rather than joins (§2.4).
  */
object Ontology {

  /** Well-known predicate names. */
  val TypePred   = "type"
  val NamePred   = "name"
  val AliasPred  = "alias"
  val SameAs     = "same_as"
  val Popularity = "popularity"

  /** Entity types of the ontology. */
  val entityTypes: Seq[String] = Seq(
    "person", "musician", "movie", "song", "album",
    "team", "city", "country", "school")

  /** Composite predicates and their relationship predicates (§2.1 Fig 2):
    * e.g. educated_at carries a relationship node with school/degree/year.
    */
  val compositePredicates: Map[String, Seq[String]] = Map(
    "educated_at" -> Seq("school", "degree", "year"),
    "member_of"   -> Seq("group", "role", "since"),
  )

  /** Volatile predicates: high-churn facts shipped as a separate full dump
    * by ingestion and fused by partition overwrite (§2.4).
    */
  val volatilePredicates: Set[String] = Set(Popularity)

  /** Predicates whose object is a reference to another KG entity and must
    * go through Object Resolution (OBR), with the expected entity type of
    * the referenced entity (used as a type hint by NERD, §6.3 / Fig 14b).
    */
  val entityRefPredicates: Map[String, String] = Map(
    "birthplace"          -> "city",
    "spouse"              -> "person",
    "recorded_by"         -> "musician",
    "part_of_album"       -> "album",
    "plays_for"           -> "team",
    "located_in"          -> "country",
    "capital_of"          -> "country",
    "home_city"           -> "city",
    "educated_at.school"  -> "school",
    "prime_minister"      -> "person",
    "mayor"               -> "person",
  )

  /** Simple (non-composite, non-volatile) literal or ref predicates each
    * entity type may carry. Used by the analytics store to schematize
    * entity-centric views (§3.2) and by matching models to pick features.
    */
  val typePredicates: Map[String, Seq[String]] = Map(
    "person"   -> Seq("name", "alias", "birth_year", "birthplace", "spouse",
                      "occupation", "height_cm", "nationality", "website",
                      "death_year", "net_worth", "awards"),
    "musician" -> Seq("name", "alias", "birth_year", "birthplace", "genre",
                      "label", "active_since", "instrument", "website",
                      "awards", "nationality"),
    "movie"    -> Seq("name", "alias", "release_year", "genre", "runtime_min",
                      "director", "rating", "budget", "box_office",
                      "language", "country_of_origin", "full_title"),
    "song"     -> Seq("name", "recorded_by", "duration_s", "tempo_bpm", "language"),
    "album"    -> Seq("name", "recorded_by", "release_year", "n_tracks",
                      "label", "genre"),
    "team"     -> Seq("name", "alias", "sport", "home_city", "founded",
                      "stadium", "league", "championships"),
    "city"     -> Seq("name", "alias", "located_in", "population",
                      "area_km2", "mayor", "timezone", "elevation_m"),
    "country"  -> Seq("name", "alias", "population", "capital",
                      "prime_minister", "area_km2", "currency", "anthem"),
    "school"   -> Seq("name", "alias", "located_in", "founded", "students", "motto"),
  )

  require(typePredicates.keySet == entityTypes.toSet, "every type needs predicates")

  /** Is `t` a known entity type? */
  def isType(t: String): Boolean = typePredicates.contains(t)

  /** Matching-model configuration per entity type (§2.3: "Matching models
    * are domain-specific and focus on specific entity types controlled by
    * the ontology"): which literal predicates beyond name/alias contribute
    * equality evidence when linking two records of that type.
    */
  val matchEvidencePredicates: Map[String, Seq[String]] = Map(
    "person"   -> Seq("birth_year", "birthplace", "occupation"),
    "musician" -> Seq("birth_year", "genre", "label"),
    "movie"    -> Seq("release_year", "director", "runtime_min"),
    "song"     -> Seq("recorded_by", "duration_s"),
    "album"    -> Seq("recorded_by", "release_year"),
    "team"     -> Seq("sport", "home_city", "founded"),
    "city"     -> Seq("located_in", "population"),
    "country"  -> Seq("capital", "currency"),
    "school"   -> Seq("located_in", "founded"),
  )

  /** Intent → the KG predicate answering it, *as a function of the argument
    * entity's type* (§4.2: HeadOfState(Canada) → prime_minister but
    * HeadOfState(Chicago) → mayor; only one interpretation is meaningful
    * per the semantics encoded in the KG).
    */
  val intentSemantics: Map[String, Map[String, String]] = Map(
    "HeadOfState" -> Map("country" -> "prime_minister", "city" -> "mayor"),
    "SpouseOf"    -> Map("person" -> "spouse", "musician" -> "spouse"),
    "Birthplace"  -> Map("person" -> "birthplace", "musician" -> "birthplace"),
    "AgeOf"       -> Map("person" -> "birth_year", "musician" -> "birth_year"),
    "PopulationOf"-> Map("city" -> "population", "country" -> "population"),
    "CapitalOf"   -> Map("country" -> "capital"),
    "GenreOf"     -> Map("movie" -> "genre", "musician" -> "genre", "album" -> "genre"),
  )

  /** Resolve an intent against the type of its argument entity; None when
    * the intent has no meaningful interpretation for that type.
    */
  def resolveIntent(intent: String, argType: String): Option[String] =
    intentSemantics.get(intent).flatMap(_.get(argType))
}
