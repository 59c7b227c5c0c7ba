package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.{AnnTableExperiment, Datasets}

/** spark-submit entrypoint reproducing Tables 1–3 (SIFT1M stand-in):
  * recall, build-time and query-time sweeps for HNSW vs RS/RH/APD at
  * (1,8)- and (2,4)-partitioning.
  *
  * Usage: spark-submit --class repro.jobs.SiftTables <jar> [workDir]
  */
object SiftTables {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("lanns-sift-tables").getOrCreate()
    val workDir = args.headOption.getOrElse("target/jobs-work")
    val cfg = AnnTableExperiment.Config(
      dataset = Datasets.siftLite,
      partitionings = Seq((1, 8), (2, 4)),
      workDir = workDir)
    val (_, tables) = AnnTableExperiment.run(spark, cfg)
    tables.foreach(t => println(t.render + "\n"))
    spark.stop()
  }
}
