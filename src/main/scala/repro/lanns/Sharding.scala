package repro.lanns

/** First-level partitioning (§4.1): a point is hashed by its document key
  * to exactly one shard; queries fan out to all shards. The hash is
  * splitmix64 so consecutive keys spread uniformly.
  */
object Sharding {

  /** Shard of document `id` among `numShards`. */
  def shardOf(id: Long, numShards: Int): Int = {
    require(numShards >= 1, s"numShards must be >= 1, got $numShards")
    java.lang.Math.floorMod(repro.VectorData.mix(0x5A4D5A4DL, id), numShards.toLong).toInt
  }
}
