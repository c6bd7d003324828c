package repro.ingest

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._
import repro.core.Ontology

/** Predicate Generation Functions and ontology alignment (§2.2).
  *
  * PGFs are lightweight, config-driven methods that populate the target
  * (KG-ontology) schema from source predicates — the paper relates them to
  * tuple-generating dependencies. Users declare source → target predicate
  * mappings; subject/object values stay in the source namespace (linking
  * happens later, during knowledge construction).
  */
object Alignment {

  /** One predicate generation function. */
  sealed trait Pgf extends Serializable { def target: String }

  /** Map one source predicate to a (possibly renamed) KG predicate,
    * e.g. `category` → `genre`.
    */
  final case class Rename(source: String, target: String) extends Pgf

  /** Combine several source predicates into one target predicate,
    * e.g. <title, sequel_number> → `full_title`.
    */
  final case class Combine(sources: Seq[String], target: String,
                           sep: String = " ") extends Pgf

  /** Emit a constant — used for source-wide facts such as locale. */
  final case class Constant(target: String, value: String) extends Pgf

  /** Arbitrary Spark-SQL expression over the source row (the escape hatch
    * for custom alignment logic, still config-as-code).
    */
  final case class Expr(sql: String, target: String) extends Pgf

  /** Alignment configuration for one entity type of one source. */
  final case class Config(
      entityType: String,
      idColumn: String,
      pgfs: Seq[Pgf],
  ) {
    require(Ontology.isType(entityType), s"unknown ontology type: $entityType")
    require(pgfs.map(_.target).distinct.size == pgfs.size,
      "each target predicate may be produced by exactly one PGF")
    val allowed: Set[String] = Ontology.typePredicates(entityType).toSet
    private val bad = pgfs.map(_.target).filterNot(t => allowed.contains(t) || t == "full_title")
    require(bad.isEmpty, s"targets not in ontology for $entityType: $bad")
  }

  /** Apply an alignment config: source entity view → target-schema rows
    * with columns `id`, `etype`, and one column per target predicate.
    * Missing source predicates surface as nulls (schema completeness is
    * the transformer's job; alignment is total).
    */
  def align(view: DataFrame, cfg: Config): DataFrame = {
    val targetCols = cfg.pgfs.map {
      case Rename(s, t)        => col(s).cast("string").as(t)
      case Combine(ss, t, sep) =>
        // concat_ws skips nulls, so <title, NULL sequel> → just the title.
        concat_ws(sep, ss.map(s => col(s).cast("string")): _*).as(t)
      case Constant(t, v)      => lit(v).as(t)
      case Expr(sql, t)        => expr(sql).cast("string").as(t)
    }
    view.select(
      (col(cfg.idColumn).cast("string").as("id") +:
       lit(cfg.entityType).as("etype") +:
       targetCols): _*)
  }
}
