package repro.lanns

import java.io.{BufferedOutputStream, DataOutputStream, FileOutputStream,
                ObjectInputStream, ObjectOutputStream, FileInputStream, File}
import org.apache.spark.sql.{Dataset, SparkSession}
import org.apache.spark.sql.functions.expr
import repro.core.{Distance, HnswIndex, HnswParams, IndexMeta, TaggedRow, VecRow}
import repro.segment.Segmenter
import scala.collection.mutable

/** The persisted description of a LANNS index (§5.2): partitioning scheme,
  * distance, HNSW parameters, the shared segmenter, and one [[IndexMeta]]
  * per (shard, segment) index file. Written from the driver; the querier
  * (offline) and an online searcher deserialize it so the serving
  * configuration can never drift from the build configuration.
  */
final case class LannsMeta(
    dim: Int,
    numShards: Int,
    distanceName: String,
    params: HnswParams,
    segmenter: Segmenter,
    indexes: Seq[IndexMeta],
) extends Serializable {
  def distance: Distance = Distance.of(distanceName)
  def numSegments: Int = segmenter.numSegments
  /** Total vectors indexed (counts physical-spill duplicates once per copy). */
  def totalCount: Long = indexes.map(_.count).sum
}

object LannsMeta {
  /** Metadata file name inside an index directory. */
  val FileName = "meta.bin"

  /** Read the metadata written by [[Indexer.build]]. */
  def read(indexDir: String): LannsMeta = {
    val in = new ObjectInputStream(new FileInputStream(new File(indexDir, FileName)))
    try in.readObject().asInstanceOf[LannsMeta]
    finally in.close()
  }

  /** Persist metadata from the driver (§5.2: "the associated metadata and
    * segmenter information is coupled with the index and written from the
    * driver").
    */
  def write(meta: LannsMeta, indexDir: String): Unit = {
    new File(indexDir).mkdirs()
    val out = new ObjectOutputStream(new FileOutputStream(new File(indexDir, FileName)))
    try out.writeObject(meta)
    finally out.close()
  }
}

/** Distributed LANNS index build (§5.2, Figure 6).
  *
  * Each document is tagged with a shard id (hash of its key) and one or
  * more segment ids (the shared pre-learnt segmenter; several under
  * physical spill). Tagged rows are packed into `numExecutors` *slots* —
  * range partitions over `(shard·m + segment) mod E` — so each Spark task
  * builds its (shard, segment) groups sequentially, exactly the schedule an
  * E-executor cluster produces. Every group becomes one serialized
  * [[HnswIndex]] file written from inside the executor; the driver collects
  * the per-index metadata and writes [[LannsMeta]].
  */
object Indexer {

  /** Build a two-level partitioned index under `outDir`.
    *
    * @param numExecutors parallelism slots emulating the paper's executor
    *                     counts (Tables 2/5)
    * @return the metadata also persisted at `outDir/meta.bin`
    */
  def build(
      data: Dataset[VecRow],
      dim: Int,
      numShards: Int,
      segmenter: Segmenter,
      distance: Distance,
      params: HnswParams,
      outDir: String,
      numExecutors: Int,
  ): LannsMeta = {
    require(numShards >= 1 && numExecutors >= 1)
    val spark = data.sparkSession
    import spark.implicits._

    val nSeg = segmenter.numSegments
    val segB = spark.sparkContext.broadcast(segmenter)
    val shards = numShards

    val tagged: Dataset[TaggedRow] = data.flatMap { r =>
      val shard = Sharding.shardOf(r.id, shards)
      segB.value.routeData(r.id, r.vec).map(seg => TaggedRow(r.id, r.vec, shard, seg))
    }

    val slotted = tagged
      .repartitionByRange(numExecutors, expr(s"(shard * $nSeg + segment) % $numExecutors"))

    val dist = distance
    val p = params
    val dir = outDir
    val metas: Array[IndexMeta] = slotted
      .mapPartitions { it =>
        val groups = mutable.LinkedHashMap.empty[(Int, Int), mutable.ArrayBuffer[(Long, Array[Float])]]
        it.foreach { t =>
          groups.getOrElseUpdate((t.shard, t.segment),
            new mutable.ArrayBuffer[(Long, Array[Float])]) += ((t.id, t.vec))
        }
        groups.iterator.map { case ((s, g), rows) =>
          val t0 = System.nanoTime()
          val idx = HnswIndex.build(dim, dist, p, rows.iterator)
          val path = indexPath(dir, s, g)
          writeIndexFile(idx, path)
          IndexMeta(s, g, rows.length.toLong, path, (System.nanoTime() - t0) / 1000000L)
        }
      }
      .collect()

    segB.destroy()
    val meta = LannsMeta(dim, numShards, distance.name, params, segmenter,
      metas.sortBy(m => (m.shard, m.segment)).toSeq)
    LannsMeta.write(meta, outDir)
    meta
  }

  /** Canonical on-disk location of one (shard, segment) index. */
  def indexPath(outDir: String, shard: Int, segment: Int): String =
    s"$outDir/shard_$shard/segment_$segment.hnsw"

  /** Serialize one index to the (HDFS-substitute) filesystem, executor-side. */
  def writeIndexFile(idx: HnswIndex, path: String): Unit = {
    val f = new File(path)
    Option(f.getParentFile).foreach(_.mkdirs())
    val out = new DataOutputStream(new BufferedOutputStream(new FileOutputStream(f)))
    try idx.writeTo(out)
    finally out.close()
  }

  /** Load one serialized index (executor-side at query time). */
  def readIndexFile(path: String): HnswIndex = {
    val in = new java.io.DataInputStream(
      new java.io.BufferedInputStream(new java.io.FileInputStream(path)))
    try HnswIndex.readFrom(in)
    finally in.close()
  }
}
