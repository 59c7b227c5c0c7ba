package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.{AnnTableExperiment, Datasets}

/** spark-submit entrypoint reproducing Tables 4–6 (GIST1M stand-in):
  * recall, build-time and query-time sweeps at (1,8)-partitioning.
  *
  * Usage: spark-submit --class repro.jobs.GistTables <jar> [workDir]
  */
object GistTables {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("lanns-gist-tables").getOrCreate()
    val workDir = args.headOption.getOrElse("target/jobs-work")
    val cfg = AnnTableExperiment.Config(
      dataset = Datasets.gistLite,
      partitionings = Seq((1, 8)),
      workDir = workDir)
    val (_, tables) = AnnTableExperiment.run(spark, cfg)
    tables.foreach(t => println(t.render + "\n"))
    spark.stop()
  }
}
