package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Harness

/** spark-submit entrypoint for the Figure-3 comparison (as a table):
  * DIABLO-generated Spark programs vs hand-written Spark programs.
  */
object Figure3Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("diablo-figure3")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    Harness.printFigure3(Harness.figure3(spark))
    spark.stop()
  }
}
