package repro.ingest

import org.apache.spark.sql.{Column, DataFrame}
import org.apache.spark.sql.functions._

/** The Data Transformer (§2.2): consumes the uniform row representation
  * from importers and produces an *entity-centric view* of the source —
  * one multi-column row per entity, columns = source predicates. It may
  * join several artifacts (e.g. raw artist info ⋈ artist popularity) but
  * adds no new predicates; it enforces the data integrity checks of §2.2.
  */
object EntityTransform {

  /** Join the primary artifact with secondary artifacts on their shared id
    * column to obtain a comprehensive one-row-per-entity description.
    *
    * @param primary    artifact carrying the entity id
    * @param idCol      name of the entity-id column in every artifact
    * @param secondary  (artifact, columns-to-bring) pairs, left-joined
    */
  def entityView(primary: DataFrame, idCol: String,
                 secondary: Seq[(DataFrame, Seq[String])] = Seq.empty): DataFrame =
    secondary.foldLeft(primary) { case (acc, (art, cols)) =>
      acc.join(art.select((idCol +: cols).distinct.map(col): _*), Seq(idCol), "left")
    }

  /** Integrity violation found by [[validate]]. */
  final case class Violation(check: String, detail: String)

  /** The five §2.2 checks, returned (not thrown) so callers can route bad
    * payloads to quarantine instead of failing the whole pipeline:
    *
    *  1. Entity IDs are unique across all entities produced.
    *  2. Each entity must have an ID predicate (non-null id) — crucial for
    *     incremental KG construction.
    *  3. Predicates must be non-empty (no blank predicate names).
    *  4. All predicates of the source schema are present in the produced
    *     entity rows (even if null/empty).
    *  5. Predicate names are unique in the source entity.
    */
  def check(view: DataFrame, idCol: String, sourceSchema: Seq[String]): Seq[Violation] = {
    val v = Seq.newBuilder[Violation]
    val cols = view.columns.toSeq

    if (!cols.contains(idCol))
      v += Violation("id-predicate", s"missing id column '$idCol'")
    else {
      val nullIds = view.filter(col(idCol).isNull || trim(col(idCol)) === "").count()
      if (nullIds > 0) v += Violation("id-predicate", s"$nullIds entities with null/blank id")
      val dupIds = view.groupBy(col(idCol)).count().filter(col("count") > 1).count()
      if (dupIds > 0) v += Violation("unique-ids", s"$dupIds duplicated entity ids")
    }

    val blank = cols.filter(_.trim.isEmpty)
    if (blank.nonEmpty) v += Violation("non-empty-predicates", s"${blank.size} blank predicate names")

    val missing = sourceSchema.filterNot(cols.contains)
    if (missing.nonEmpty)
      v += Violation("schema-complete", s"source predicates absent from entity view: $missing")

    val dups = cols.groupBy(identity).collect { case (c, xs) if xs.size > 1 => c }
    if (dups.nonEmpty) v += Violation("unique-predicates", s"duplicated predicate names: $dups")

    v.result()
  }

  /** Validate-or-throw variant for pipelines that must not proceed on a
    * broken payload.
    */
  def validate(view: DataFrame, idCol: String, sourceSchema: Seq[String]): DataFrame = {
    val vs = check(view, idCol, sourceSchema)
    require(vs.isEmpty, s"entity-transform integrity violations: $vs")
    view
  }

  /** Convenience: a null-safe trim of all string-typed predicate columns —
    * sources routinely pad literals.
    */
  def trimStrings(view: DataFrame): DataFrame = {
    val exprs: Seq[Column] = view.schema.fields.map { f =>
      if (f.dataType == org.apache.spark.sql.types.StringType) trim(col(f.name)).as(f.name)
      else col(f.name)
    }.toSeq
    view.select(exprs: _*)
  }
}
