package repro.construct

import org.apache.spark.sql.{DataFrame, SparkSession}
import org.apache.spark.sql.functions._
import repro.ml.StringSim

/** Blocking (§2.3 step 3): distribute entities across buckets with
  * lightweight key functions so that likely matches share a bucket,
  * reducing the quadratic pair space. Each record emits several keys
  * (multi-pass blocking) over its name *and* aliases, so a typo in one
  * rendering still collides on another key.
  */
object Blocking {

  /** Blocking key functions over a single name string. Keys are cheap,
    * deterministic, and tolerant of different failure modes:
    *   - prefix: first 4 chars of the normalized string (head typos lose it,
    *     tail typos keep it),
    *   - tokens: initial trigrams of the first two sorted tokens (word
    *     reorderings keep it),
    *   - skeleton: the consonant skeleton (vowel typos keep it).
    */
  def keysForName(name: String): Seq[String] = {
    val n = StringSim.normalize(name)
    if (n.isEmpty) return Seq.empty
    val prefix = "p:" + n.replace(" ", "").take(4)
    val toks = n.split(' ').sorted.take(2).map(_.take(3)).mkString("t:", "_", "")
    val skel = "s:" + n.replace(" ", "").filterNot("aeiou".contains(_)).take(6)
    Seq(prefix, toks, skel).distinct
  }

  /** All blocking keys of a record: type-scoped keys over name + aliases. */
  def keysForRecord(etype: String, name: String, aliases: Seq[String]): Seq[String] =
    (name +: aliases).flatMap(keysForName).distinct.map(k => s"$etype|$k")

  /** Entity records (columns: id, etype, name, aliases) → block membership
    * (blockKey, id). Oversized blocks (low-information keys) are dropped —
    * the standard guard against quadratic blow-up in skewed blocks.
    */
  def blocks(records: DataFrame, maxBlockSize: Int = 200): DataFrame = {
    val spark = records.sparkSession
    import spark.implicits._
    val membership = records
      .select($"id", $"etype", $"name", $"aliases")
      .as[(String, String, String, Seq[String])]
      .flatMap { case (id, etype, name, aliases) =>
        keysForRecord(etype, name, Option(aliases).getOrElse(Seq.empty)).map(k => (k, id))
      }
      .toDF("blockKey", "id")
      .dropDuplicates("blockKey", "id")
    val sizes = membership.groupBy("blockKey").count()
    membership.join(sizes.filter($"count" <= maxBlockSize).select("blockKey"), Seq("blockKey"))
  }

  /** Candidate pairs from block co-membership (§2.3 step 4 input): all
    * unordered pairs within a block, deduplicated across blocks.
    */
  def candidatePairs(blocks: DataFrame): DataFrame = {
    val a = blocks.select(col("blockKey"), col("id").as("id1"))
    val b = blocks.select(col("blockKey"), col("id").as("id2"))
    a.join(b, Seq("blockKey"))
      .filter(col("id1") < col("id2"))
      .select("id1", "id2")
      .dropDuplicates("id1", "id2")
  }
}
