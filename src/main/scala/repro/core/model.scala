package repro.core

/** A dense vector row of the indexable dataset.
  *
  * @param id  external document key (used for sharding and recall joins)
  * @param vec dense embedding, `dim` floats
  */
final case class VecRow(id: Long, vec: Array[Float])

/** A query vector.
  *
  * @param qid query key (joins results with ground truth)
  * @param vec dense embedding
  */
final case class QueryRow(qid: Long, vec: Array[Float])

/** A data row tagged with its two-level partition: (shard, segment).
  * Physical spill can emit the same `id` under several segments.
  */
final case class TaggedRow(id: Long, vec: Array[Float], shard: Int, segment: Int)

/** A query routed to one (shard, segment) pair; virtual spill emits the
  * same `qid` under several segments of each shard.
  */
final case class RoutedQuery(qid: Long, vec: Array[Float], shard: Int, segment: Int)

/** One partial search result produced inside an executor. */
final case class Hit(qid: Long, shard: Int, segment: Int, id: Long, dist: Double)

/** Metadata for one per-(shard, segment) HNSW index persisted by the
  * indexer; the driver aggregates these into [[repro.lanns.LannsMeta]].
  *
  * @param buildMillis wall-clock build time of this one index inside its task
  */
final case class IndexMeta(shard: Int, segment: Int, count: Long, path: String, buildMillis: Long)

/** A scored neighbor returned by an index search. */
final case class Neighbor(id: Long, dist: Double)
