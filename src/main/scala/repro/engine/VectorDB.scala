package repro.engine

import java.util.concurrent.ConcurrentHashMap
import scala.jdk.CollectionConverters._
import repro.ml.StringSim

/** The Vector DB store of the Graph Engine (§3.2/§5.3): stores learned
  * embeddings and serves nearest-neighbour search with attribute filters
  * (e.g. "entity type = person" to produce a subset of people embeddings,
  * Figure 7).
  *
  * Exact cosine top-k over an in-memory store — the correct semantics at
  * reproduction scale; the paper's store is a distributed ANN service
  * with the same interface.
  */
final class VectorDB {

  final case class Entry(id: String, vector: Array[Double], attrs: Map[String, String])

  private val entries = new ConcurrentHashMap[String, Entry]()

  def upsert(id: String, vector: Array[Double], attrs: Map[String, String] = Map.empty): Unit =
    entries.put(id, Entry(id, vector, attrs))

  def delete(id: String): Unit = entries.remove(id)

  def get(id: String): Option[Entry] = Option(entries.get(id))

  def size: Int = entries.size()

  /** Top-k by cosine similarity, optionally restricted to entries whose
    * attribute `key` equals `value` (the attribute filter of Figure 7).
    */
  def knn(query: Array[Double], k: Int,
          filter: Option[(String, String)] = None): Seq[(String, Double)] = {
    val it = entries.values.asScala.iterator
    val filtered = filter match {
      case Some((key, v)) => it.filter(_.attrs.get(key).contains(v))
      case None           => it
    }
    filtered
      .map(e => e.id -> StringSim.cosine(query, e.vector))
      .toSeq
      .sortBy { case (id, s) => (-s, id) }
      .take(k)
  }
}
