package repro.lanns

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.{Hit, QueryRow, RoutedQuery}
import scala.collection.mutable

/** Distributed querying over a two-level partitioned index (§5.3, Figure 7).
  *
  * Queries are routed (every shard; the segmenter's virtual-spill segment
  * set) and packed into executor slots like the indexer. Each task loads its
  * (shard, segment) index once, runs partial HNSW searches, and emits
  * per-segment hits. Merging is two-level, mirroring the online system:
  * segment hits merge *within* a shard first (keeping the perShardTopK best,
  * §5.3.2), then shard results merge globally to the final topK. Both merges
  * are Catalyst `Window` operators over repartitioned keys.
  *
  * Partial results can be checkpointed to a temporary directory between
  * stages (§5.3.1's defense against cascading executor time-outs); pass
  * `checkpointDir` to exercise that path.
  */
object Querier {

  /** Search `queries` against the index described by `meta` rooted at the
    * paths inside it.
    *
    * @param topK        neighbors per query in the final result
    * @param efSearch    HNSW beam width (clamped up to the per-shard k)
    * @param confidence  topK.confidence for the perShardTopK reduction;
    *                    None disables it (each shard returns topK)
    * @param numExecutors parallelism slots emulating executor counts
    * @param checkpointDir when set, partial results are persisted to
    *                    `<dir>/partial_hits` and reloaded before merging
    * @return DataFrame (qid, id, dist, rank) with rank in 1..topK
    */
  def search(
      queries: Dataset[QueryRow],
      meta: LannsMeta,
      topK: Int,
      efSearch: Int,
      confidence: Option[Double] = None,
      numExecutors: Int = 8,
      checkpointDir: Option[String] = None,
  ): DataFrame = {
    val spark = queries.sparkSession
    import spark.implicits._

    val kShard = confidence.map(PerShardTopK(topK, meta.numShards, _)).getOrElse(topK)
    val nSeg = meta.numSegments
    val shards = meta.numShards
    val paths: Map[(Int, Int), String] =
      meta.indexes.map(m => (m.shard, m.segment) -> m.path).toMap
    val segB = spark.sparkContext.broadcast(meta.segmenter)
    val pathsB = spark.sparkContext.broadcast(paths)

    // Route: all shards × the segmenter's query segments (virtual spill).
    val routed: Dataset[RoutedQuery] = queries.flatMap { q =>
      val segs = segB.value.routeQuery(q.vec)
      for {
        s <- 0 until shards
        g <- segs
        if pathsB.value.contains((s, g)) // empty partitions have no index
      } yield RoutedQuery(q.qid, q.vec, s, g)
    }

    val slotted = routed
      .repartitionByRange(numExecutors, expr(s"(shard * $nSeg + segment) % $numExecutors"))

    val dist = meta.distance
    val ef = math.max(efSearch, kShard)
    val kPartial = kShard
    val rawHits: Dataset[Hit] = slotted.mapPartitions { it =>
      val byGroup = mutable.LinkedHashMap.empty[(Int, Int), mutable.ArrayBuffer[(Long, Array[Float])]]
      it.foreach { r =>
        byGroup.getOrElseUpdate((r.shard, r.segment),
          new mutable.ArrayBuffer[(Long, Array[Float])]) += ((r.qid, r.vec))
      }
      byGroup.iterator.flatMap { case ((s, g), qs) =>
        val idx = Indexer.readIndexFile(pathsB.value((s, g)))
        qs.iterator.flatMap { case (qid, vec) =>
          idx.search(vec, kPartial, ef).iterator.map(n => Hit(qid, s, g, n.id, n.dist))
        }
      }
    }

    val hits = checkpointDir match {
      case Some(dir) => checkpoint(rawHits.toDF(), s"$dir/partial_hits")
      case None      => rawHits.toDF()
    }

    val merged = mergeHits(hits, kShard, topK)
    checkpointDir match {
      case Some(dir) =>
        // The temp dir is deleted "as soon as two-level merging finishes"
        // (§5.3.1) — materialize the merge first so the plan no longer
        // depends on the checkpointed files.
        val out = merged.cache()
        out.count()
        cleanup(dir)
        out
      case None => merged
    }
  }

  /** Two-level merge (§5.3): segment hits → per-shard top `kShard`
    * (deduplicating ids that physical spill stored in several segments),
    * then shard results → global top `topK`.
    *
    * @param hits DataFrame with columns (qid, shard, segment, id, dist)
    * @return DataFrame (qid, id, dist, rank)
    */
  def mergeHits(hits: DataFrame, kShard: Int, topK: Int): DataFrame = {
    // Level 1: within (query, shard) — physical spill can surface the same
    // id from several segments; keep its best distance, then the shard's top.
    val shardLevel = hits
      .groupBy("qid", "shard", "id")
      .agg(min("dist").as("dist"))
      .withColumn("shard_rank",
        row_number().over(Window.partitionBy("qid", "shard").orderBy(col("dist"), col("id"))))
      .filter(col("shard_rank") <= kShard)

    // Level 2: across shards — the broker-side merge.
    shardLevel
      .withColumn("rank",
        row_number().over(Window.partitionBy("qid").orderBy(col("dist"), col("id"))))
      .filter(col("rank") <= topK)
      .select("qid", "id", "dist", "rank")
  }

  /** Persist a stage's output to the HDFS-substitute directory and reload
    * it (§5.3.1): completed tasks' results survive later executor loss.
    */
  def checkpoint(df: DataFrame, path: String): DataFrame = {
    df.write.mode("overwrite").parquet(path)
    df.sparkSession.read.parquet(path)
  }

  /** Remove a temporary checkpoint directory once merging finished. */
  def cleanup(dir: String): Unit = {
    def rm(f: java.io.File): Unit = {
      if (f.isDirectory) f.listFiles().foreach(rm)
      f.delete(); ()
    }
    val f = new java.io.File(dir)
    if (f.exists()) rm(f)
  }
}
