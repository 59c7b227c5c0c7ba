package repro.e2e

import java.nio.file.Files
import repro.{SparkSpec, VectorData}
import repro.core.{Distance, HnswParams}
import repro.eval.Recall
import repro.lanns.{Indexer, LannsMeta, Querier, SparkBruteForce}
import repro.segment.SegmenterLearner

/** Full-pipeline integration: learn segmenter → two-level build → persist →
  * reload from disk metadata → distributed query with checkpoints and
  * perShardTopK → recall vs Spark brute force. A miniature of the entire
  * LANNS offline flow (Figures 5–8).
  */
class EndToEndSpec extends SparkSpec {

  private val params = HnswParams(m = 12, efConstruction = 80, efSearch = 80, seed = 1L)

  test("(2,4)-partitioned APD index achieves near-HNSW recall end-to-end") {
    val data = VectorData.clustered(spark, 4000, 16, 15, seed = 31L).cache()
    val queries = VectorData.clusteredQueries(spark, 60, 16, 15, seed = 31L).cache()
    val truth = SparkBruteForce.search(data, queries, 10, Distance.Euclidean, 8).cache()

    val dir = Files.createTempDirectory("e2e-apd").toString
    val sample = SegmenterLearner.sample(data, 4000, 1L)
    val seg = SegmenterLearner.learnAPD(sample, 16, depth = 2, alpha = 0.15)
    Indexer.build(data, 16, numShards = 2, seg, Distance.Euclidean, params, dir, 8)

    // reload everything from disk, as an online searcher would
    val meta = LannsMeta.read(dir)
    val ckpt = Files.createTempDirectory("e2e-ck").toString + "/tmp"
    val res = Querier.search(queries, meta, topK = 10, efSearch = 100,
      Some(0.95), numExecutors = 8, Some(ckpt))

    val recall = Recall.atK(res, truth, 10)
    assert(recall >= 0.85, s"end-to-end recall@10 = $recall")
  }

  test("RS segmentation reaches HNSW-level recall (paper Table 1 ordering)") {
    val data = VectorData.clustered(spark, 4000, 16, 15, seed = 32L).cache()
    val queries = VectorData.clusteredQueries(spark, 60, 16, 15, seed = 32L).cache()
    val truth = SparkBruteForce.search(data, queries, 10, Distance.Euclidean, 8).cache()

    val hnswDir = Files.createTempDirectory("e2e-hnsw").toString
    val hnswMeta = Indexer.build(data, 16, 1, new repro.segment.RandomSegmenter(1),
      Distance.Euclidean, params, hnswDir, 1)
    val hnswRecall = Recall.atK(
      Querier.search(queries, hnswMeta, 10, 100, None, 1), truth, 10)

    val rsDir = Files.createTempDirectory("e2e-rs").toString
    val rsMeta = Indexer.build(data, 16, 1, new repro.segment.RandomSegmenter(8),
      Distance.Euclidean, params, rsDir, 8)
    val rsRecall = Recall.atK(
      Querier.search(queries, rsMeta, 10, 100, None, 8), truth, 10)

    assert(hnswRecall >= 0.9, s"HNSW recall@10 = $hnswRecall")
    assert(rsRecall >= hnswRecall - 0.05,
      s"RS recall $rsRecall far below HNSW $hnswRecall")
  }
}
