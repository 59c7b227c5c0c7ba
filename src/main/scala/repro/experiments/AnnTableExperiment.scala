package repro.experiments

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.core.{Distance, HnswParams}
import repro.eval.Recall
import repro.lanns.{Indexer, Querier, SparkBruteForce}
import repro.segment.{RandomSegmenter, Segmenter, SegmenterLearner}

/** The harness behind Tables 1–3 (SIFT1M) and Tables 4–6 (GIST1M): recall
  * of HNSW vs the (n, m)-partitioned RS / RH / APD indices, plus build-time
  * and query-time sweeps over emulated executor counts.
  */
object AnnTableExperiment {

  /** Everything one run needs; defaults mirror §6.1 (α = 0.15,
    * topK.confidence = 0.95, topK = 100).
    */
  final case class Config(
      dataset: DatasetSpec,
      partitionings: Seq[(Int, Int)],
      executorSweep: Seq[Int] = Seq(2, 4, 8),
      topK: Int = 100,
      ks: Seq[Int] = Seq(1, 5, 10, 15, 50, 100),
      alpha: Double = 0.15,
      confidence: Double = 0.95,
      hnsw: HnswParams = HnswParams(m = 16, efConstruction = 120, efSearch = 150),
      efSearch: Int = 150,
      sampleSize: Int = 20000,
      workDir: String = "target/bench-work",
  )

  /** Raw measurements; the bench suites assert on these and render the
    * tables from them.
    */
  final case class Results(
      hnswRecall: Map[Int, Double],
      recall: Map[(String, (Int, Int)), Map[Int, Double]],
      hnswBuildMillis: Long,
      buildMillis: Map[(String, Int), Long],
      hnswQueryMsPerQ: Double,
      queryMsPerQ: Map[(String, (Int, Int), Int), Double],
      learnMillis: Map[String, Long],
  )

  val Methods: Seq[String] = Seq("RS", "RH", "APD")

  private def log2(m: Int): Int = {
    require(m >= 2 && (m & (m - 1)) == 0, s"segments per shard must be a power of two >= 2, got $m")
    java.lang.Integer.numberOfTrailingZeros(m)
  }

  /** Build the segmenter for `method` with `m` segments per shard, learning
    * RH/APD on `sample` (shared across shards, §5.1). Returns the segmenter
    * and the learning wall-time (0 for RS, which needs no pre-learning).
    */
  def mkSegmenter(method: String, m: Int, alpha: Double, dim: Int,
                  sample: Array[Array[Float]], seed: Long): (Segmenter, Long) = method match {
    case "RS" => (new RandomSegmenter(m, seed), 0L)
    case "RH" =>
      val (s, t) = Fmt.timed(SegmenterLearner.learnRH(sample, dim, log2(m), alpha, seed))
      (s, t)
    case "APD" =>
      val (s, t) = Fmt.timed(SegmenterLearner.learnAPD(sample, dim, log2(m), alpha, seed))
      (s, t)
    case other => throw new IllegalArgumentException(s"unknown method $other")
  }

  /** Run the full experiment for one dataset. */
  def run(spark: SparkSession, cfg: Config): (Results, Seq[ExpTable]) = {
    val ds = cfg.dataset
    val data = ds.data(spark).cache()
    data.count() // materialize (and warm up the session)
    val queries = ds.queries(spark).cache()
    val nQueries = queries.count()

    val truth = SparkBruteForce
      .search(data, queries, cfg.topK, Distance.Euclidean, numPartitions = 16)
      .cache()
    truth.count()

    val maxE = cfg.executorSweep.max
    val work = s"${cfg.workDir}/${ds.name}"

    def buildAt(tag: String, shards: Int, seg: Segmenter, e: Int) = {
      val dir = s"$work/$tag"
      Fmt.timed(Indexer.build(data, ds.dim, shards, seg, Distance.Euclidean, cfg.hnsw, dir, e))
    }

    def queryAt(meta: repro.lanns.LannsMeta, e: Int,
                checkpoint: Option[String] = None): (DataFrame, Long) = {
      val (df, ms) = Fmt.timed {
        val d = Querier.search(queries, meta, cfg.topK, cfg.efSearch,
          Some(cfg.confidence), e, checkpoint).cache()
        d.count()
        d
      }
      (df, ms)
    }

    // ---- HNSW baseline: one unpartitioned index, one slot ----------------
    val (hnswMeta, hnswBuildMs) = buildAt("hnsw", 1, new RandomSegmenter(1), 1)
    val (hnswRes, hnswQueryMs0) = queryAt(hnswMeta, 1)
    val hnswRecall = Recall.atKs(hnswRes, truth, cfg.ks)
    hnswRes.unpersist()
    val hnswQueryMs = math.min(hnswQueryMs0, { val (d, t) = queryAt(hnswMeta, 1); d.unpersist(); t })

    val sample = SegmenterLearner.sample(data, cfg.sampleSize, ds.seed + 9)

    var recall = Map.empty[(String, (Int, Int)), Map[Int, Double]]
    var learn = Map.empty[String, Long]
    var buildMs = Map.empty[(String, Int), Long]
    var queryMs = Map.empty[(String, (Int, Int), Int), Double]

    for (method <- Methods; (s, m) <- cfg.partitionings) {
      val (seg, learnT) = mkSegmenter(method, m, cfg.alpha, ds.dim, sample, ds.seed + 17)
      learn += s"$method($s,$m)" -> learnT

      // Recall: build once at max executors, query at max executors,
      // exercising the checkpoint path of §5.3.1.
      val (meta, _) = buildAt(s"${method}_${s}x${m}_recall", s, seg, maxE)
      val (res, _) = queryAt(meta, maxE, Some(s"$work/ckpt_${method}_${s}x$m"))
      recall += (method, (s, m)) -> Recall.atKs(res, truth, cfg.ks)
      res.unpersist()

      // Query-time sweep (Tables 3/6) over emulated executor counts; each
      // point is the min of two runs to damp JIT/GC noise at this scale.
      for (e <- cfg.executorSweep) {
        val ms = Seq.fill(2) {
          val (df, t) = queryAt(meta, e)
          df.unpersist()
          t
        }.min
        queryMs += (method, (s, m), e) -> ms.toDouble / nQueries
      }

      // Build-time sweep (Tables 2/5): the paper reports one build-time
      // table per dataset — times barely change across partitionings since
      // segmenters are pre-learnt — so we sweep the first partitioning.
      if ((s, m) == cfg.partitionings.head) {
        for (e <- cfg.executorSweep) {
          val (_, ms) = buildAt(s"${method}_${s}x${m}_E$e", s, seg, e)
          buildMs += (method, e) -> ms
        }
      }
    }

    val results = Results(hnswRecall, recall, hnswBuildMs, buildMs,
      hnswQueryMs.toDouble / nQueries, queryMs, learn)
    (results, render(ds.name, cfg, results))
  }

  /** Render the paper-shaped tables from raw results. */
  def render(name: String, cfg: Config, r: Results): Seq[ExpTable] = {
    val recallT = ExpTable(
      s"Recall for $name (paper Table 1/4 shape)",
      "Method" +: cfg.ks.map(k => s"R@$k"),
      (Seq("HNSW" +: cfg.ks.map(k => Fmt.f4(r.hnswRecall(k)))) ++
        (for ((s, m) <- cfg.partitionings; method <- Methods) yield
          s"$method($s,$m)" +: cfg.ks.map(k => Fmt.f4(r.recall((method, (s, m)))(k))))),
    )
    val buildT = ExpTable(
      s"Build times for $name, minutes (paper Table 2/5 shape)",
      Seq("Executors", "HNSW", "RS", "RH", "APD"),
      cfg.executorSweep.zipWithIndex.map { case (e, i) =>
        Seq(e.toString,
          if (i == 0) Fmt.minutes(r.hnswBuildMillis.toDouble) else "-") ++
          Methods.map(mth => Fmt.minutes(r.buildMillis((mth, e)).toDouble))
      },
    )
    val queryT = ExpTable(
      s"Query times for $name, ms/query (paper Table 3/6 shape)",
      Seq("Executors", "HNSW") ++
        cfg.partitionings.flatMap { case (s, m) => Methods.map(mth => s"$mth($s,$m)") },
      cfg.executorSweep.zipWithIndex.map { case (e, i) =>
        Seq(e.toString, if (i == 0) Fmt.f2(r.hnswQueryMsPerQ) else "-") ++
          cfg.partitionings.flatMap { case (s, m) =>
            Methods.map(mth => Fmt.f2(r.queryMsPerQ((mth, (s, m), e))))
          }
      },
    )
    val learnT = ExpTable(
      s"Segmenter pre-learning times for $name, seconds",
      Seq("Segmenter", "Seconds"),
      r.learnMillis.toSeq.sorted.map { case (k, v) => Seq(k, Fmt.f2(v / 1000.0)) },
    )
    Seq(recallT, buildT, queryT, learnT)
  }
}
