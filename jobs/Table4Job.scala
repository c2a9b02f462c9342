package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.exp.TableRunner

/** spark-submit entrypoint reproducing Table 4 (real-data comparison over
  * the simulated mall dataset built by the trajectory → flow-counting
  * pipeline, which runs as Spark DataFrame jobs).
  *
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [instances] [reps]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-table4")
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()
    try {
      val opts0 = TableRunner.Opts()
      val opts = args.toList match {
        case i :: r :: _ => opts0.copy(instances = i.toInt, reps = r.toInt)
        case i :: Nil    => opts0.copy(instances = i.toInt)
        case Nil         => opts0
      }
      println(TableRunner.table4(spark, opts).rendered)
    } finally spark.stop()
  }
}
