package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.experiments.RealWorldExperiment

/** spark-submit entrypoint reproducing Tables 8 & 9: build/query times and
  * recall on the four real-world stand-ins (PYMK, People, NearDupe, Groups).
  *
  * Usage: spark-submit --class repro.jobs.RealWorldTables <jar> [workDir]
  */
object RealWorldTables {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder.appName("lanns-real-world-tables").getOrCreate()
    val workDir = args.headOption.getOrElse("target/jobs-work")
    val (_, tables) =
      RealWorldExperiment.run(spark, RealWorldExperiment.Config(workDir = workDir))
    tables.foreach(t => println(t.render + "\n"))
    spark.stop()
  }
}
