package repro.sim

import org.apache.spark.sql.{DataFrame, Dataset, SparkSession}
import org.apache.spark.sql.expressions.Window
import org.apache.spark.sql.functions._
import repro.crowd.EdgeKey
import repro.indoor.IndoorSpace
import scala.collection.mutable

/** The paper's probabilistic flow-counting method (§6.2, after
  * [Li et al., TKDE'18]) as a Spark DataFrame pipeline:
  *
  *  1. consecutive positioning records per object are paired (window lag);
  *  2. topologically-connected pairs contribute flow 1 at the connecting
  *     door; disconnected pairs are resolved into the set Φ of valid
  *     sub-paths (those ≤ 2× the shortest are kept) with probabilities
  *     `P(φ_i) = (1/len(φ_i)) / Σ (1/len(φ_k))`, and every door on φ_i
  *     receives P(φ_i);
  *  3. door flows are sampled per 10 s window and Poisson rates λ fitted
  *     per directed door edge.
  */
object FlowCounting {

  final case class PairRow(obj: Long, t1: Double, p1: Int, t2: Double, p2: Int)
  final case class Crossing(door: Int, src: Int, dst: Int, t: Double, prob: Double)

  /** Consecutive-record pairs per object. */
  def consecutivePairs(records: DataFrame): DataFrame = {
    val w = Window.partitionBy("obj").orderBy("t")
    records
      .select(col("obj"), col("t"), col("part"))
      .withColumn("t2", lead("t", 1).over(w))
      .withColumn("p2", lead("part", 1).over(w))
      .where(col("t2").isNotNull)
      .select(col("obj"), col("t").as("t1"), col("part").as("p1"), col("t2"), col("p2"))
  }

  /** Directed sub-paths between two partitions as door sequences with
    * probabilities. Paths are simple partition sequences of ≤ `maxHops`
    * intermediate partitions; those longer than twice the shortest are
    * excluded, as in the paper.
    */
  def subPaths(space: IndoorSpace, a: Int, b: Int, maxHops: Int = 4, maxPaths: Int = 12): Seq[(Seq[(Int, Int, Int)], Double)] = {
    val results = mutable.ArrayBuffer.empty[(Seq[(Int, Int, Int)], Double)]
    def pathLen(doorsSeq: Seq[(Int, Int, Int)]): Double =
      if (doorsSeq.size < 2) 1.0
      else doorsSeq.sliding(2).map { case Seq((d1, _, mid), (d2, _, _)) => math.max(1.0, space.doorDist(mid, d1, d2)) }.sum

    def dfs(cur: Int, visited: List[Int], doorsAcc: List[(Int, Int, Int)]): Unit =
      if (results.size < maxPaths) {
        if (cur == b) {
          if (doorsAcc.nonEmpty) results += ((doorsAcc.reverse, pathLen(doorsAcc.reverse)))
        } else if (visited.size <= maxHops) {
          space.outLinks(cur).foreach { l =>
            if (!visited.contains(l.to) && results.size < maxPaths)
              dfs(l.to, l.to :: visited, (l.door, l.from, l.to) :: doorsAcc)
          }
        }
      }
    dfs(a, List(a), Nil)
    if (results.isEmpty) Seq.empty
    else {
      val shortest = results.map(_._2).min
      val valid    = results.filter(_._2 <= 2 * shortest)
      val norm     = valid.map(p => 1.0 / p._2).sum
      valid.map { case (ds, len) => (ds, (1.0 / len) / norm) }.toSeq
    }
  }

  /** Resolve every pair into door crossings with probabilities. */
  def crossings(spark: SparkSession, space: IndoorSpace, pairs: DataFrame): Dataset[Crossing] = {
    import spark.implicits._
    val pairDs = pairs.as[PairRow]
    // distinct partition transitions, resolved once on the driver then broadcast
    val transitions = pairDs
      .filter(p => p.p1 != p.p2)
      .map(p => (p.p1, p.p2))
      .distinct()
      .collect()
    val resolved: Map[(Int, Int), Seq[(Seq[(Int, Int, Int)], Double)]] =
      transitions.map { case (a, b) =>
        val direct = space.outLinks(a).filter(_.to == b).map(_.door).sorted.headOption
        val paths = direct match {
          case Some(d) => Seq((Seq((d, a, b)), 1.0))
          case None    => subPaths(space, a, b)
        }
        (a, b) -> paths
      }.toMap
    val resolvedB = spark.sparkContext.broadcast(resolved)
    pairDs.flatMap { p =>
      if (p.p1 == p.p2) Iterator.empty
      else
        resolvedB.value.getOrElse((p.p1, p.p2), Seq.empty).iterator.flatMap { case (doorsSeq, prob) =>
          val n = doorsSeq.size
          doorsSeq.zipWithIndex.map { case ((door, src, dst), i) =>
            val tInterp = p.t1 + (p.t2 - p.t1) * (i + 1).toDouble / (n + 1).toDouble
            Crossing(door, src, dst, tInterp, prob)
          }
        }
    }
  }

  /** Flows per directed door edge per `windowSec` window. */
  def windowedFlows(crossings: Dataset[Crossing], windowSec: Double = 10.0): DataFrame =
    crossings
      .toDF()
      .withColumn("win", floor(col("t") / windowSec).cast("long"))
      .groupBy("door", "src", "dst", "win")
      .agg(sum("prob").as("flow"))

  /** Poisson rate per directed edge: total counted flow over the number of
    * observation windows (the MLE over all windows, zero windows included).
    */
  def fitLambdas(flows: DataFrame, nWindows: Long, scale: Double = 1.0): Map[EdgeKey, Double] = {
    require(nWindows > 0)
    flows
      .groupBy("door", "src", "dst")
      .agg(sum("flow").as("total"))
      .collect()
      .map(r => EdgeKey(r.getInt(1), r.getInt(2), r.getInt(0)) -> r.getDouble(3) * scale / nWindows)
      .toMap
  }

  /** Fraction of consecutive pairs that are not topologically connected —
    * the paper reports ≈12% on the real data.
    */
  def disconnectedFraction(spark: SparkSession, space: IndoorSpace, pairs: DataFrame): Double = {
    import spark.implicits._
    val linkSet = space.links.map(l => (l.from, l.to)).toSet
    val linkB   = spark.sparkContext.broadcast(linkSet)
    val flags = pairs.as[PairRow].map { p =>
      if (p.p1 == p.p2 || linkB.value.contains((p.p1, p.p2))) 0 else 1
    }
    val n = flags.count()
    if (n == 0) 0.0 else flags.map(_.toLong).reduce(_ + _).toDouble / n
  }
}
