package repro.sim

import org.apache.spark.sql.SparkSession
import org.apache.spark.sql.functions._
import repro.crowd.CrowdModel
import repro.indoor.{IndoorSpace, SynthFloorplan}

/** End-to-end construction of the "real data" crowd model (§6.2): mall
  * space → synthetic trajectories → probabilistic flow counting → fitted
  * Poisson rates, latest populations, and per-partition flow histories.
  *
  * The paper's single trajectory dataset stands for a fully-populated mall;
  * since our 1,598 synthetic trajectories sample that crowd sparsely, a
  * flow `scale` factor (objects represented per trajectory) lifts counted
  * flows and populations to mall-realistic magnitudes — λ lands in the
  * paper's observed [0, 3] range. Documented in DESIGN.md §5.2.
  */
object RealDataPipeline {

  final case class Built(space: IndoorSpace, model: CrowdModel, disconnectedFraction: Double, records: Long)

  def build(
      spark: SparkSession,
      nObjects: Int = 1598,
      span: Double = 3600.0,
      scale: Double = 25.0,
      seed: Long = 11L,
      histLen: Int = 20,
      /** space override for small-scale tests; defaults to the paper's mall */
      spaceOverride: Option[IndoorSpace] = None,
  ): Built = {
    val space = spaceOverride.getOrElse(SynthFloorplan.mall(seed))
    val traj  = TrajectoryGen.generate(spark, space, nObjects, span, seed = seed).cache()
    val nRecords = traj.count()

    val pairs    = FlowCounting.consecutivePairs(traj).cache()
    val discFrac = FlowCounting.disconnectedFraction(spark, space, pairs)
    val cross    = FlowCounting.crossings(spark, space, pairs).cache()
    val flows    = FlowCounting.windowedFlows(cross).cache()
    val nWindows = math.max(1L, (span / 10.0).toLong)
    val lambdas  = FlowCounting.fitLambdas(flows, nWindows, scale)

    // latest populations: objects by last-known partition, scaled, capped by capacity
    val lastPart = traj
      .groupBy("obj")
      .agg(max(struct(col("t"), col("part"))).as("last"))
      .select(col("last.part").as("part"))
      .groupBy("part")
      .count()
      .collect()
      .map(r => r.getInt(0) -> r.getLong(1).toDouble)
      .toMap
    val initialPop = (0 until space.numPartitions).map { v =>
      math.min(lastPart.getOrElse(v, 0.0) * scale, space.partitions(v).area * 1.0)
    }

    // flow-difference history per partition over the last `histLen` windows
    val histStart = nWindows - histLen
    val inflow = flows.where(col("win") >= histStart).groupBy(col("dst").as("part"), col("win"))
      .agg(sum("flow").as("inf"))
    val outflow = flows.where(col("win") >= histStart).groupBy(col("src").as("part"), col("win"))
      .agg(sum("flow").as("outf"))
    val net = inflow
      .join(outflow, Seq("part", "win"), "outer")
      .select(col("part"), col("win"),
        (coalesce(col("inf"), lit(0.0)) - coalesce(col("outf"), lit(0.0))).as("net"))
      .collect()
      .groupBy(_.getInt(0))
      .view
      .mapValues(_.sortBy(_.getLong(1)).map(_.getDouble(2) * scale).toVector)
      .toMap
    val historyNet = (0 until space.numPartitions).map(v => net.getOrElse(v, Vector.fill(histLen)(0.0)))

    // door counters sampled every 10 s in the real pipeline -> period 1 grid step
    val model = new CrowdModel(
      space,
      lambdas,
      reportEvery = IndexedSeq.fill(space.numDoors)(1),
      ti = 10,
      t0 = 0.0,
      initialPop = initialPop,
      historyNet = historyNet,
    )
    traj.unpersist(); pairs.unpersist(); cross.unpersist(); flows.unpersist()
    Built(space, model, discFrac, nRecords)
  }
}
