package repro.eval

import org.apache.spark.sql.DataFrame
import org.apache.spark.sql.functions._

/** Recall@k against exact ground truth: the fraction of the true k nearest
  * neighbors present in the returned top-k (the paper's metric, §1).
  */
object Recall {

  /** Recall@k of `results` against `truth`; both are DataFrames with
    * columns (qid, id, rank) — ranks 1-based, as produced by
    * [[repro.lanns.Querier.search]] / [[repro.lanns.SparkBruteForce.search]].
    *
    * The denominator is the number of *truth* rows with rank ≤ k, so
    * queries near a dataset boundary (fewer than k true neighbors) are
    * handled exactly.
    */
  def atK(results: DataFrame, truth: DataFrame, k: Int): Double = {
    val r = results.filter(col("rank") <= k).select("qid", "id")
    val t = truth.filter(col("rank") <= k).select("qid", "id")
    val denom = t.count()
    if (denom == 0) 0.0
    else r.join(t, Seq("qid", "id")).count().toDouble / denom
  }

  /** Recall at several cutoffs in one call (Tables 1 and 4 report
    * R@{1,5,10,15,50,100}).
    */
  def atKs(results: DataFrame, truth: DataFrame, ks: Seq[Int]): Map[Int, Double] =
    ks.map(k => k -> atK(results, truth, k)).toMap
}
