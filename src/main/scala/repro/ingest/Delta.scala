package repro.ingest

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Eager delta computation (§2.2/§2.4). When an upstream provider
  * publishes a new version, the ingestion pipeline splits source entities
  * into three partitions relative to the last snapshot consumed by the KG:
  *
  *   - Added:   exist at t_n but not t_0
  *   - Deleted: exist at t_0 but not t_n
  *   - Updated: exist at both and their *stable* payload changed at t_n
  *
  * plus a separate full dump of volatile predicates (e.g. popularity) for
  * *all* current entities — volatile churn is factored out of the deltas
  * so that a popularity tick does not masquerade as an entity update.
  */
object Delta {

  final case class SourceDelta(
      added: DataFrame,
      deleted: DataFrame,
      updated: DataFrame,
      volatileDump: DataFrame,
  ) {
    def counts(): (Long, Long, Long) = (added.count(), deleted.count(), updated.count())
  }

  /** Stable-payload fingerprint: hash of every column except the id and
    * the volatile columns. Column order is fixed (sorted) so the hash does
    * not depend on projection order.
    */
  def stableHash(df: DataFrame, idCol: String, volatileCols: Set[String]) = {
    val stable = df.columns.filterNot(c => c == idCol || volatileCols.contains(c)).sorted
    sha2(to_json(struct(stable.map(col): _*)), 256)
  }

  /** Compute the delta of `cur` versus `prev`.
    *
    * `added`/`updated` carry the full current rows (they flow into
    * construction); `deleted` carries the previous rows (construction
    * needs the old payload to retract provenance).
    */
  def compute(prev: DataFrame, cur: DataFrame, idCol: String = "id",
              volatileCols: Set[String] = Set("volatile")): SourceDelta = {
    require(prev.columns.sorted.sameElements(cur.columns.sorted),
      s"snapshot schemas differ: ${prev.columns.sorted.toSeq} vs ${cur.columns.sorted.toSeq}")

    val p = prev.withColumn("__h", stableHash(prev, idCol, volatileCols))
    val c = cur.withColumn("__h", stableHash(cur, idCol, volatileCols))

    val pk = p.select(col(idCol).as("__pid"), col("__h").as("__ph"))
    val ck = c.select(col(idCol).as("__cid"), col("__h").as("__ch"))
    val j = pk.join(ck, pk("__pid") === ck("__cid"), "full_outer")

    val addedIds   = j.filter(col("__pid").isNull).select(col("__cid").as(idCol))
    val deletedIds = j.filter(col("__cid").isNull).select(col("__pid").as(idCol))
    val updatedIds = j.filter(col("__pid").isNotNull && col("__cid").isNotNull &&
                              col("__ph") =!= col("__ch"))
                      .select(col("__cid").as(idCol))

    SourceDelta(
      added        = cur.join(addedIds,   Seq(idCol), "left_semi"),
      deleted      = prev.join(deletedIds, Seq(idCol), "left_semi"),
      updated      = cur.join(updatedIds, Seq(idCol), "left_semi"),
      volatileDump = cur.select((idCol +: volatileCols.toSeq.sorted.filter(cur.columns.contains)).map(col): _*),
    )
  }

  /** A brand-new source is modeled as a full Added payload with empty
    * Deleted/Updated partitions (§2.4).
    */
  def bootstrap(cur: DataFrame, idCol: String = "id",
                volatileCols: Set[String] = Set("volatile")): SourceDelta =
    SourceDelta(
      added = cur,
      deleted = cur.limit(0),
      updated = cur.limit(0),
      volatileDump = cur.select((idCol +: volatileCols.toSeq.sorted.filter(cur.columns.contains)).map(col): _*),
    )
}
