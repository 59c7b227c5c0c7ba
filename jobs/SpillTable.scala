package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.SpillExperiment

/** spark-submit entrypoint reproducing Table 7: physical vs virtual spill
  * (R@15, QPS) on the Groups stand-in for segments ∈ {1,4,8,16} and spill
  * ∈ {10,20,30}%.
  *
  * Usage: spark-submit --class repro.jobs.SpillTable <jar> [workDir]
  */
object SpillTable {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("lanns-spill-table").getOrCreate()
    val workDir = args.headOption.getOrElse("target/jobs-work")
    val (_, table) = SpillExperiment.run(spark, SpillExperiment.Config(workDir = workDir))
    println(table.render)
    spark.stop()
  }
}
