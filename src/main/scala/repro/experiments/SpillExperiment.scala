package repro.experiments

import org.apache.spark.sql.SparkSession
import repro.core.{Distance, HnswParams}
import repro.eval.Recall
import repro.lanns.{Indexer, Querier, SparkBruteForce}
import repro.segment.{RandomSegmenter, SegmenterLearner}

/** Table 7: physical vs virtual spill on the Groups dataset — R@15 and QPS
  * for a multi-segmented APD index over segments ∈ {1, 4, 8, 16} and spill
  * ∈ {10, 20, 30}%.
  *
  * §6.1 fixes the spill-percentage convention: "α = 0.15, i.e., we route
  * about 30% queries to both partitions", so spill% = 2α·100 and the sweep
  * uses α ∈ {0.05, 0.10, 0.15}.
  */
object SpillExperiment {

  final case class Config(
      dataset: DatasetSpec = Datasets.groupsLite,
      segmentCounts: Seq[Int] = Seq(1, 4, 8, 16),
      spillPercents: Seq[Int] = Seq(10, 20, 30),
      k: Int = 15,
      hnsw: HnswParams = HnswParams(m = 16, efConstruction = 120, efSearch = 60),
      efSearch: Int = 60,
      numExecutors: Int = 8,
      sampleSize: Int = 20000,
      workDir: String = "target/bench-work",
  )

  /** One sweep point: recall@15 and queries/second for both spill modes. */
  final case class Row(segments: Int, spillPct: Int,
                       physRecall: Double, physQps: Double,
                       virtRecall: Double, virtQps: Double)

  def run(spark: SparkSession, cfg: Config): (Seq[Row], ExpTable) = {
    val ds = cfg.dataset
    val data = ds.data(spark).cache(); data.count()
    val queries = ds.queries(spark).cache()
    val nQueries = queries.count()
    val truth = SparkBruteForce
      .search(data, queries, cfg.k, Distance.Euclidean, numPartitions = 16)
      .cache()
    truth.count()

    val sample = SegmenterLearner.sample(data, cfg.sampleSize, ds.seed + 9)
    val work = s"${cfg.workDir}/${ds.name}-spill"

    def measure(tag: String, seg: repro.segment.Segmenter): (Double, Double) = {
      val meta = Indexer.build(data, ds.dim, numShards = 1, seg, Distance.Euclidean,
        cfg.hnsw, s"$work/$tag", cfg.numExecutors)
      def once(): (Double, Long) = {
        val (res, ms) = Fmt.timed {
          val d = Querier.search(queries, meta, cfg.k, cfg.efSearch,
            confidence = None, numExecutors = cfg.numExecutors).cache()
          d.count()
          d
        }
        val rec = Recall.atK(res, truth, cfg.k)
        res.unpersist()
        (rec, ms)
      }
      // QPS is the max of two runs (min wall time) to damp JIT/GC noise.
      val (rec, ms1) = once()
      val (_, ms2) = once()
      (rec, nQueries.toDouble / (math.min(ms1, ms2) / 1000.0))
    }

    val rows = cfg.segmentCounts.flatMap {
      case 1 =>
        // Unsegmented baseline row (segments = 1, spill 0%): one HNSW index;
        // physical and virtual spill coincide by construction.
        val (rec, qps) = measure("seg1", new RandomSegmenter(1))
        Seq(Row(1, 0, rec, qps, rec, qps))
      case m =>
        val depth = java.lang.Integer.numberOfTrailingZeros(m)
        cfg.spillPercents.map { pct =>
          val alpha = pct / 200.0 // spill% = 2α·100
          val virt = SegmenterLearner.learnAPD(sample, ds.dim, depth, alpha, ds.seed + 17)
          val phys = virt.withPhysicalSpill(true)
          val (pr, pq) = measure(s"seg${m}_s${pct}_phys", phys)
          val (vr, vq) = measure(s"seg${m}_s${pct}_virt", virt)
          Row(m, pct, pr, pq, vr, vq)
        }
    }

    val table = ExpTable(
      s"Spill comparison on ${ds.name}, APD segmentation (paper Table 7 shape)",
      Seq("Segments", "Spill", "Phys R@15", "Phys QPS", "Virt R@15", "Virt QPS"),
      rows.map(r => Seq(r.segments.toString, s"${r.spillPct}%",
        Fmt.f4(r.physRecall), Fmt.f2(r.physQps), Fmt.f4(r.virtRecall), Fmt.f2(r.virtQps))),
    )
    (rows, table)
  }
}
