package repro.lanns

import java.nio.file.Files
import repro.{SparkSpec, VectorData}
import repro.core.{Distance, HnswParams}
import repro.segment.{RandomSegmenter, SegmenterLearner}

class IndexerSpec extends SparkSpec {

  private val params = HnswParams(m = 8, efConstruction = 50, efSearch = 40, seed = 1L)

  private def tmpDir(): String =
    Files.createTempDirectory("lanns-indexer").toString

  test("builds one index per (shard, segment) pair") {
    val data = VectorData.clustered(spark, 800, 8, 5, seed = 1L)
    val dir = tmpDir()
    val meta = Indexer.build(data, 8, numShards = 2, new RandomSegmenter(3), Distance.Euclidean,
      params, dir, numExecutors = 4)
    assert(meta.indexes.size === 6)
    assert(meta.indexes.map(m => (m.shard, m.segment)).toSet ===
      (for (s <- 0 until 2; g <- 0 until 3) yield (s, g)).toSet)
  }

  test("every row is indexed exactly once under virtual spill") {
    val data = VectorData.clustered(spark, 1000, 8, 5, seed = 2L)
    val meta = Indexer.build(data, 8, 2, new RandomSegmenter(4), Distance.Euclidean,
      params, tmpDir(), 4)
    assert(meta.totalCount === 1000L)
  }

  test("physical spill indexes boundary rows more than once") {
    val data = VectorData.clustered(spark, 2000, 8, 6, seed = 3L)
    val sample = SegmenterLearner.sample(data, 2000, 1L)
    val seg = SegmenterLearner.learnRH(sample, 8, depth = 1, alpha = 0.15).withPhysicalSpill(true)
    val meta = Indexer.build(data, 8, 1, seg, Distance.Euclidean, params, tmpDir(), 4)
    assert(meta.totalCount > 2000L, s"no duplication: ${meta.totalCount}")
    assert(meta.totalCount < 3200L, s"excessive duplication: ${meta.totalCount}")
  }

  test("index files exist on disk and deserialize to searchable indices") {
    val data = VectorData.clustered(spark, 600, 8, 4, seed = 4L)
    val dir = tmpDir()
    val meta = Indexer.build(data, 8, 1, new RandomSegmenter(2), Distance.Euclidean,
      params, dir, 2)
    meta.indexes.foreach { im =>
      assert(new java.io.File(im.path).isFile, s"missing ${im.path}")
      val idx = Indexer.readIndexFile(im.path)
      assert(idx.size.toLong === im.count)
      assert(idx.search(Array.fill(8)(0f), 3).nonEmpty)
    }
  }

  test("metadata round-trips through the driver-written meta file") {
    val data = VectorData.clustered(spark, 300, 8, 4, seed = 5L)
    val dir = tmpDir()
    val meta = Indexer.build(data, 8, 2, new RandomSegmenter(2, seed = 9L), Distance.Euclidean,
      params, dir, 2)
    val back = LannsMeta.read(dir)
    assert(back.dim === 8)
    assert(back.numShards === 2)
    assert(back.distanceName === "l2")
    assert(back.params === params)
    assert(back.numSegments === 2)
    assert(back.indexes === meta.indexes)
  }

  test("a learnt segmenter survives meta serialization and routes identically") {
    val data = VectorData.clustered(spark, 800, 8, 4, seed = 6L)
    val sample = SegmenterLearner.sample(data, 800, 2L)
    val seg = SegmenterLearner.learnAPD(sample, 8, depth = 2, alpha = 0.1)
    val dir = tmpDir()
    Indexer.build(data, 8, 1, seg, Distance.Euclidean, params, dir, 2)
    val back = LannsMeta.read(dir).segmenter
    val rng = new java.util.Random(3L)
    (0 until 50).foreach { _ =>
      val v = Array.fill(8)(rng.nextFloat())
      assert(back.routeQuery(v).toSeq === seg.routeQuery(v).toSeq)
    }
  }

  test("per-index counts sum over the hash-sharded split") {
    val data = VectorData.clustered(spark, 1200, 8, 4, seed = 7L)
    val meta = Indexer.build(data, 8, 3, new RandomSegmenter(1), Distance.Euclidean,
      params, tmpDir(), 3)
    // shard sizes follow the id-hash split
    val expected = (0L until 1200L).groupBy(Sharding.shardOf(_, 3)).view.mapValues(_.size).toMap
    meta.indexes.foreach(im => assert(im.count === expected(im.shard).toLong))
  }

  test("executor slotting does not change what gets indexed") {
    val data = VectorData.clustered(spark, 900, 8, 4, seed = 8L)
    val m1 = Indexer.build(data, 8, 2, new RandomSegmenter(4, 5L), Distance.Euclidean,
      params, tmpDir(), numExecutors = 1)
    val m8 = Indexer.build(data, 8, 2, new RandomSegmenter(4, 5L), Distance.Euclidean,
      params, tmpDir(), numExecutors = 8)
    val c1 = m1.indexes.map(im => (im.shard, im.segment) -> im.count).toMap
    val c8 = m8.indexes.map(im => (im.shard, im.segment) -> im.count).toMap
    assert(c1 === c8)
  }

  test("empty (shard, segment) groups yield no index files") {
    // 1 row, 4 shards x 4 segments: at most one group non-empty
    val data = VectorData.clustered(spark, 1, 8, 2, seed = 9L)
    val meta = Indexer.build(data, 8, 4, new RandomSegmenter(4), Distance.Euclidean,
      params, tmpDir(), 4)
    assert(meta.indexes.size === 1)
    assert(meta.totalCount === 1L)
  }

  test("build times are recorded per index") {
    val data = VectorData.clustered(spark, 500, 8, 4, seed = 10L)
    val meta = Indexer.build(data, 8, 1, new RandomSegmenter(2), Distance.Euclidean,
      params, tmpDir(), 2)
    meta.indexes.foreach(im => assert(im.buildMillis >= 0))
  }
}
