package repro.segment

/** Second-level partitioner of LANNS (§4.2–4.3): assigns data points and
  * routes queries to segments within a shard.
  *
  * The contract mirrors the paper's spill options (§4.3.2, footnote 1):
  *  - *virtual spill* duplicates **queries** near a boundary
  *    (`routeQuery` may return several segments, `routeData` exactly one);
  *  - *physical spill* duplicates **data** near a boundary
  *    (`routeData` may return several segments, `routeQuery` exactly one).
  *
  * The same learnt segmenter is shared across all shards (§5.1), so
  * implementations must be [[Serializable]] for broadcast to executors.
  */
trait Segmenter extends Serializable {

  /** Number of segments per shard. */
  def numSegments: Int

  /** Segment id(s) the document `(id, vec)` is stored in. Always non-empty;
    * returns more than one only under physical spill.
    */
  def routeData(id: Long, vec: Array[Float]): Array[Int]

  /** Segment id(s) a query must be sent to. Always non-empty; returns more
    * than one under virtual spill, or all segments for data-independent
    * segmenters.
    */
  def routeQuery(vec: Array[Float]): Array[Int]
}

/** The data-independent Random Segmenter (§4.3.1): "essentially a modulo
  * segmenter" on the document key. With no locality information, every
  * query fans out to all segments.
  */
final class RandomSegmenter(val numSegments: Int, seed: Long = 0L) extends Segmenter {
  require(numSegments >= 1, s"numSegments must be >= 1, got $numSegments")

  private val all = Array.range(0, numSegments)

  def routeData(id: Long, vec: Array[Float]): Array[Int] =
    Array(java.lang.Math.floorMod(repro.VectorData.mix(seed, id), numSegments.toLong).toInt)

  def routeQuery(vec: Array[Float]): Array[Int] = all

  override def toString: String = s"RandomSegmenter($numSegments)"
}
