package repro.live

import java.util.concurrent.ConcurrentHashMap
import scala.jdk.CollectionConverters._
import repro.ml.StringSim

/** The live KG serving stores (§4.1): a sharded key-value store holding
  * entity records and a sharded inverted index over their textual fields.
  * Both are optimized for low-latency retrieval under high concurrency;
  * sharding gives tight control over per-shard load (scale-out stands in
  * for the paper's replicated index fleet).
  */
object Stores {

  /** An entity record in the live KG: predicate → values. Values that are
    * entity identifiers (kg:/live: prefixes) encode graph edges.
    */
  type Record = Map[String, Seq[String]]

  final class KVStore(val shards: Int = 16) {
    private val maps = Array.fill(shards)(new ConcurrentHashMap[String, Record]())
    private def shard(id: String): ConcurrentHashMap[String, Record] =
      maps(math.floorMod(id.hashCode, shards))

    def put(id: String, rec: Record): Unit = shard(id).put(id, rec)
    def get(id: String): Option[Record] = Option(shard(id).get(id))
    def delete(id: String): Unit = shard(id).remove(id)
    def size: Int = maps.map(_.size()).sum
    def ids: Seq[String] = maps.toSeq.flatMap(_.keySet().asScala)

    /** Atomically transform a record (used by curation hot-fixes). */
    def update(id: String)(f: Record => Record): Unit =
      shard(id).computeIfPresent(id, (_, r) => f(r))
  }

  final case class Posting(id: String, field: String)

  final class InvertedIndex(val shards: Int = 16) {
    private val maps = Array.fill(shards)(new ConcurrentHashMap[String, Set[Posting]]())
    private def shard(tok: String): ConcurrentHashMap[String, Set[Posting]] =
      maps(math.floorMod(tok.hashCode, shards))

    def index(id: String, field: String, text: String): Unit =
      StringSim.tokens(text).distinct.foreach { t =>
        shard(t).merge(t, Set(Posting(id, field)), (a, b) => a ++ b)
      }

    def indexRecord(id: String, rec: Record): Unit =
      rec.foreach { case (field, vals) => vals.foreach(v => index(id, field, v)) }

    def postings(token: String): Set[Posting] =
      shard(StringSim.normalize(token)).getOrDefault(StringSim.normalize(token), Set.empty)

    /** Ids whose `field` contains every token of `text`. */
    def lookup(text: String, field: Option[String] = None): Set[String] = {
      val toks = StringSim.tokens(text)
      if (toks.isEmpty) return Set.empty
      toks.map { t =>
        val ps = postings(t)
        (field match { case Some(f) => ps.filter(_.field == f); case None => ps }).map(_.id)
      }.reduce(_ intersect _)
    }

    /** Remove all postings of an id (re-index after curation edits). */
    def remove(id: String): Unit =
      maps.foreach { m =>
        m.replaceAll((_, ps) => ps.filterNot(_.id == id))
      }

    def tokenCount: Int = maps.map(_.size()).sum
  }
}
