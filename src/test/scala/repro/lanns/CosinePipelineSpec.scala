package repro.lanns

import java.nio.file.Files
import repro.{SparkSpec, VectorData}
import repro.core.{Distance, HnswParams}
import repro.eval.Recall

/** The distributed pipeline under the cosine metric — LANNS serves both
  * distance functions (the metadata records which was used at build time so
  * serving cannot drift, §7).
  */
class CosinePipelineSpec extends SparkSpec {

  private val params = HnswParams(m = 8, efConstruction = 60, efSearch = 60, seed = 1L)

  test("cosine metadata round-trips and recall stays high") {
    val data = VectorData.clustered(spark, 2000, 12, 8, seed = 41L).cache()
    val queries = VectorData.clusteredQueries(spark, 30, 12, 8, seed = 41L).cache()
    val truth = SparkBruteForce.search(data, queries, 10, Distance.Cosine, 8).cache()

    val dir = Files.createTempDirectory("cosine-idx").toString
    Indexer.build(data, 12, 2, new repro.segment.RandomSegmenter(2), Distance.Cosine,
      params, dir, 4)
    val meta = LannsMeta.read(dir)
    assert(meta.distance === Distance.Cosine)

    val res = Querier.search(queries, meta, 10, 80, Some(0.95), 4)
    val recall = Recall.atK(res, truth, 10)
    assert(recall >= 0.85, s"cosine recall@10 = $recall")
  }

  test("cosine and euclidean ground truths differ (the metric matters)") {
    val data = VectorData.uniform(spark, 500, 6, seed = 42L).cache()
    val queries = VectorData.clusteredQueries(spark, 10, 6, 4, seed = 42L).cache()
    val l2 = SparkBruteForce.search(data, queries, 5, Distance.Euclidean, 4)
      .collect().map(r => (r.getLong(0), r.getLong(1), r.getInt(3))).toSet
    val cos = SparkBruteForce.search(data, queries, 5, Distance.Cosine, 4)
      .collect().map(r => (r.getLong(0), r.getLong(1), r.getInt(3))).toSet
    assert(l2 !== cos)
  }
}
