package repro.lanns

import org.apache.spark.sql.{DataFrame, Dataset}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.core.{BruteForce, Distance, Hit, QueryRow, VecRow}

/** Spark brute-force search (§5.4, Figure 8) — exact top-K at scale, used
  * for ground truth in all recall evaluations (the paper's "in-house Spark
  * implementation of brute-force search").
  *
  * The dataset is split across `numPartitions` tasks; the (reasonably
  * small) query set is broadcast whole into every task, which computes an
  * exact per-partition top-K with a bounded heap. Partial results can be
  * written to the HDFS substitute and reloaded (as in Figure 8) before the
  * final per-query merge — a Catalyst `Window` over the query id.
  */
object SparkBruteForce {

  /** Exact top-`k` for each query.
    *
    * @return DataFrame (qid, id, dist, rank), rank 1..k by ascending
    *         distance, ties by id
    */
  def search(
      data: Dataset[VecRow],
      queries: Dataset[QueryRow],
      k: Int,
      distance: Distance,
      numPartitions: Int = 8,
      checkpointDir: Option[String] = None,
  ): DataFrame = {
    val spark = data.sparkSession
    import spark.implicits._

    val qArr = queries.collect()
    val qB = spark.sparkContext.broadcast(qArr)
    val dist = distance
    val kk = k

    val partials: Dataset[Hit] = data
      .repartition(numPartitions)
      .mapPartitions { it =>
        val items = it.map(r => (r.id, r.vec)).toArray
        if (items.isEmpty) Iterator.empty
        else qB.value.iterator.flatMap { q =>
          BruteForce.topK(items, q.vec, kk, dist).iterator
            .map(n => Hit(q.qid, 0, 0, n.id, n.dist))
        }
      }

    val hits = checkpointDir match {
      case Some(dir) => Querier.checkpoint(partials.toDF(), s"$dir/bf_partials")
      case None      => partials.toDF()
    }

    val merged = hits
      .withColumn("rank",
        row_number().over(Window.partitionBy("qid").orderBy(col("dist"), col("id"))))
      .filter(col("rank") <= kk)
      .select("qid", "id", "dist", "rank")

    checkpointDir match {
      case Some(dir) =>
        val out = merged.cache(); out.count(); Querier.cleanup(dir); out
      case None => merged
    }
  }
}
