package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.sim.RealDataPipeline

/** spark-submit entrypoint that runs the real-data substrate pipeline alone
  * (trajectories → probabilistic flow counting → fitted λ) and prints a
  * summary — useful for inspecting the Table 4 input model.
  */
object FlowCountJob {
  def main(args: Array[String]): Unit = {
    val spark = SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName("repro-flowcount")
      .getOrCreate()
    try {
      val built   = RealDataPipeline.build(spark)
      val lambdas = built.model.lambda.values
      println(s"records:               ${built.records}")
      println(f"disconnected pairs:    ${built.disconnectedFraction * 100}%.2f%%")
      println(s"partitions/doors:      ${built.space.numPartitions}/${built.space.numDoors}")
      println(s"edges with flow:       ${lambdas.count(_ > 0)}/${built.model.edges.size}")
      if (lambdas.nonEmpty) {
        println(f"lambda max/mean:       ${lambdas.max}%.3f / ${lambdas.sum / lambdas.size}%.4f")
      }
      println(f"total population:      ${built.model.initialPop.sum}%.1f")
    } finally spark.stop()
  }
}
