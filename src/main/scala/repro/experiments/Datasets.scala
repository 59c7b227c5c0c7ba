package repro.experiments

import org.apache.spark.sql.{Dataset, SparkSession}
import repro.VectorData
import repro.core.{QueryRow, VecRow}

/** A named synthetic dataset standing in for one of the paper's corpora
  * (see DESIGN.md "Substitutions"): a Gaussian mixture with `nClusters`
  * centers — embedding corpora are strongly clustered, which is what the
  * data-dependent segmenters exploit.
  */
final case class DatasetSpec(
    name: String,
    n: Long,
    dim: Int,
    nClusters: Int,
    std: Double,
    nQueries: Long,
    seed: Long,
) {
  def data(spark: SparkSession): Dataset[VecRow] =
    VectorData.clustered(spark, n, dim, nClusters, std, seed)

  def queries(spark: SparkSession): Dataset[QueryRow] =
    VectorData.clusteredQueries(spark, nQueries, dim, nClusters, std, seed)
}

/** The scaled-down stand-ins for the paper's six evaluation datasets.
  * Sizes are chosen so a full table reproduction runs in minutes on one
  * node while keeping every code path (sharding, segmentation, spill,
  * two-level merge, perShardTopK) hot.
  */
object Datasets {

  /** SIFT1M stand-in (paper: 1M × 128, 10k queries). Cluster std is set so
    * clusters overlap: with cleanly separated clusters every segmenter
    * looks perfect, hiding the paper's RH recall drop.
    */
  val siftLite: DatasetSpec =
    DatasetSpec("siftLite", n = 40000, dim = 32, nClusters = 100, std = 0.22,
      nQueries = 2000, seed = 101L)

  /** GIST1M stand-in (paper: 1M × 960, 1k queries) — the higher-dimensional,
    * slower-distance regime relative to siftLite.
    */
  val gistLite: DatasetSpec =
    DatasetSpec("gistLite", n = 15000, dim = 128, nClusters = 60, std = 0.2,
      nQueries = 500, seed = 202L)

  /** Groups stand-in (paper: 2.7M × 256, 10k queries) for the Table 7
    * spill sweep.
    */
  val groupsLite: DatasetSpec =
    DatasetSpec("groupsLite", n = 24000, dim = 64, nClusters = 80, std = 0.2,
      nQueries = 1500, seed = 303L)

  /** People Search stand-in (paper: 180M × 50, 20k queries, 32 shards). */
  val peopleLite: DatasetSpec =
    DatasetSpec("peopleLite", n = 90000, dim = 25, nClusters = 150, std = 0.15,
      nQueries = 500, seed = 404L)

  /** PYMK stand-in (paper: 100M × 50, 1M recall queries, 20 shards). */
  val pymkLite: DatasetSpec =
    DatasetSpec("pymkLite", n = 60000, dim = 25, nClusters = 120, std = 0.15,
      nQueries = 500, seed = 505L)

  /** Near-duplicate images stand-in (paper: 148k × 2048, 0.5M queries). */
  val nearDupeLite: DatasetSpec =
    DatasetSpec("nearDupeLite", n = 15000, dim = 256, nClusters = 50, std = 0.12,
      nQueries = 400, seed = 606L)
}
