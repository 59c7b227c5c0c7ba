package repro.lanns

import java.nio.file.Files
import repro.{Oracle, SparkSpec, VectorData}
import repro.core.{Distance, HnswParams}
import repro.eval.Recall
import repro.segment.{RandomSegmenter, SegmenterLearner}

class QuerierSpec extends SparkSpec {

  private val params = HnswParams(m = 8, efConstruction = 60, efSearch = 60, seed = 1L)

  private def tmpDir(prefix: String): String =
    Files.createTempDirectory(prefix).toString

  test("two-level merge matches the DuckDB oracle") {
    import spark.implicits._
    // hand-built partial hits: 2 queries, 2 shards, 2 segments each
    val hits = Seq(
      // qid, shard, segment, id, dist
      (1L, 0, 0, 10L, 1.5), (1L, 0, 1, 11L, 0.5), (1L, 0, 1, 12L, 2.5),
      (1L, 1, 0, 20L, 1.0), (1L, 1, 1, 21L, 3.0), (1L, 1, 0, 22L, 0.25),
      (2L, 0, 0, 10L, 4.0), (2L, 0, 1, 10L, 3.5), // same id from two segments
      (2L, 1, 0, 30L, 0.75), (2L, 1, 1, 31L, 1.25),
    ).toDF("qid", "shard", "segment", "id", "dist")

    val merged = Querier.mergeHits(hits, kShard = 2, topK = 3)
    Oracle.assertEquivalent(
      merged,
      """WITH sb AS (
        |  SELECT CAST(qid AS BIGINT) AS qid, CAST(shard AS INT) AS shard,
        |         CAST(id AS BIGINT) AS id, MIN(CAST(dist AS DOUBLE)) AS dist
        |  FROM hits GROUP BY 1, 2, 3),
        |sr AS (
        |  SELECT qid, shard, id, dist,
        |         row_number() OVER (PARTITION BY qid, shard ORDER BY dist, id) AS rn
        |  FROM sb)
        |SELECT qid, id, dist, rank FROM (
        |  SELECT qid, id, dist,
        |         row_number() OVER (PARTITION BY qid ORDER BY dist, id) AS rank
        |  FROM sr WHERE rn <= 2)
        |WHERE rank <= 3""".stripMargin,
      "hits" -> hits,
    )
  }

  test("end-to-end recall with RS segmentation is high on clustered data") {
    val data = VectorData.clustered(spark, 3000, 16, 12, seed = 2L).cache()
    val queries = VectorData.clusteredQueries(spark, 40, 16, 12, seed = 2L).cache()
    val truth = SparkBruteForce.search(data, queries, 10, Distance.Euclidean, 8).cache()
    val meta = Indexer.build(data, 16, 2, new RandomSegmenter(2), Distance.Euclidean,
      params, tmpDir("q-rs"), 4)
    val res = Querier.search(queries, meta, 10, efSearch = 80, None, 4)
    assert(Recall.atK(res, truth, 10) >= 0.9)
  }

  test("ranks are contiguous from 1 and capped at topK") {
    val data = VectorData.clustered(spark, 1000, 8, 6, seed = 3L)
    val queries = VectorData.clusteredQueries(spark, 10, 8, 6, seed = 3L)
    val meta = Indexer.build(data, 8, 2, new RandomSegmenter(3), Distance.Euclidean,
      params, tmpDir("q-rank"), 4)
    val res = Querier.search(queries, meta, 7, 60, None, 4).collect()
    res.groupBy(_.getLong(0)).values.foreach { rows =>
      val ranks = rows.map(_.getInt(3)).sorted.toSeq
      assert(ranks === (1 to rows.length))
      assert(rows.length <= 7)
    }
  }

  test("no duplicate ids per query even with physical spill") {
    val data = VectorData.clustered(spark, 2000, 8, 6, seed = 4L)
    val queries = VectorData.clusteredQueries(spark, 20, 8, 6, seed = 4L)
    val sample = SegmenterLearner.sample(data, 2000, 1L)
    val seg = SegmenterLearner.learnRH(sample, 8, 2, alpha = 0.2).withPhysicalSpill(true)
    val meta = Indexer.build(data, 8, 1, seg, Distance.Euclidean, params, tmpDir("q-phys"), 4)
    val res = Querier.search(queries, meta, 10, 60, None, 4).collect()
    res.groupBy(_.getLong(0)).values.foreach { rows =>
      val ids = rows.map(_.getLong(1)).toSeq
      assert(ids.distinct.length === ids.length, s"duplicate ids: $ids")
    }
  }

  test("executor slotting does not change query results") {
    val data = VectorData.clustered(spark, 1500, 8, 6, seed = 5L)
    val queries = VectorData.clusteredQueries(spark, 15, 8, 6, seed = 5L)
    val meta = Indexer.build(data, 8, 2, new RandomSegmenter(2), Distance.Euclidean,
      params, tmpDir("q-slots"), 4)
    def rows(e: Int) = Querier.search(queries, meta, 8, 60, None, e)
      .orderBy("qid", "rank").collect().map(r => (r.getLong(0), r.getLong(1))).toSeq
    assert(rows(1) === rows(8))
  }

  test("checkpointing gives identical results and cleans the temp dir") {
    val data = VectorData.clustered(spark, 1000, 8, 5, seed = 6L)
    val queries = VectorData.clusteredQueries(spark, 10, 8, 5, seed = 6L)
    val meta = Indexer.build(data, 8, 1, new RandomSegmenter(2), Distance.Euclidean,
      params, tmpDir("q-ck"), 4)
    val ckpt = tmpDir("q-ck-tmp") + "/work"
    val plain = Querier.search(queries, meta, 5, 60, None, 4)
      .orderBy("qid", "rank").collect().map(r => (r.getLong(0), r.getLong(1))).toSeq
    val chk = Querier.search(queries, meta, 5, 60, None, 4, Some(ckpt))
      .orderBy("qid", "rank").collect().map(r => (r.getLong(0), r.getLong(1))).toSeq
    assert(chk === plain)
    assert(!new java.io.File(ckpt).exists(), "checkpoint dir not cleaned")
  }

  test("perShardTopK reduction still returns the full topK after the merge") {
    val data = VectorData.clustered(spark, 2000, 8, 6, seed = 7L)
    val queries = VectorData.clusteredQueries(spark, 10, 8, 6, seed = 7L)
    val meta = Indexer.build(data, 8, 4, new RandomSegmenter(1), Distance.Euclidean,
      params, tmpDir("q-pstk"), 4)
    val res = Querier.search(queries, meta, topK = 20, 60, Some(0.95), 4).collect()
    res.groupBy(_.getLong(0)).values.foreach(rows => assert(rows.length === 20))
  }

  test("perShardTopK barely affects recall at high confidence (its design goal)") {
    val data = VectorData.clustered(spark, 2000, 8, 6, seed = 8L).cache()
    val queries = VectorData.clusteredQueries(spark, 30, 8, 6, seed = 8L).cache()
    val truth = SparkBruteForce.search(data, queries, 10, Distance.Euclidean, 8).cache()
    val meta = Indexer.build(data, 8, 4, new RandomSegmenter(1), Distance.Euclidean,
      params, tmpDir("q-pstk2"), 4)
    val full = Recall.atK(Querier.search(queries, meta, 10, 80, None, 4), truth, 10)
    val reduced = Recall.atK(Querier.search(queries, meta, 10, 80, Some(0.95), 4), truth, 10)
    assert(reduced >= full - 0.05, s"reduced=$reduced full=$full")
  }

  test("virtual-spill hyperplane segmenter searches only a few segments per query") {
    val data = VectorData.clustered(spark, 2000, 8, 6, seed = 9L)
    val queries = VectorData.clusteredQueries(spark, 50, 8, 6, seed = 9L)
    val sample = SegmenterLearner.sample(data, 2000, 1L)
    val seg = SegmenterLearner.learnRH(sample, 8, depth = 3, alpha = 0.1)
    // average routed segments per query must be far below all 8
    val avg = queries.collect().map(q => seg.routeQuery(q.vec).length).sum / 50.0
    assert(avg < 4.0, s"avg segments per query $avg")
    // and the pipeline still returns results for every query
    val meta = Indexer.build(data, 8, 1, seg, Distance.Euclidean, params, tmpDir("q-virt"), 4)
    val res = Querier.search(queries, meta, 5, 60, None, 4)
    assert(res.select("qid").distinct().count() === 50)
  }

  test("queries work when some (shard, segment) groups are empty") {
    import org.apache.spark.sql.functions.col
    // tiny data, many partitions: some groups get no rows at all
    val data = VectorData.clustered(spark, 6, 8, 2, seed = 10L)
    val queries = VectorData.clusteredQueries(spark, 5, 8, 2, seed = 10L)
    val meta = Indexer.build(data, 8, 2, new RandomSegmenter(4), Distance.Euclidean,
      params, tmpDir("q-empty"), 4)
    assert(meta.indexes.size < 8) // sanity: emptiness actually occurred
    val res = Querier.search(queries, meta, 3, 60, None, 4)
    assert(res.filter(col("rank") === 1).count() === 5) // every query got something
  }
}
