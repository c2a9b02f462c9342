package repro.sim

import org.apache.spark.sql.{DataFrame, SparkSession}
import repro.indoor.IndoorSpace
import scala.collection.mutable.ArrayBuffer
import scala.util.Random

/** Synthetic indoor positioning data standing in for the paper's real mall
  * trajectories (1,598 objects, ≈90k records, §6.2). Objects perform random
  * walks over the partition graph, emitting positioning records while
  * dwelling; a record-level dropout knob creates the ≈12% of consecutive
  * samples that are *not* topologically connected, which is what exercises
  * the probabilistic flow-counting method.
  */
object TrajectoryGen {

  final case class Rec(obj: Long, t: Double, part: Int, x: Double, y: Double, floor: Int)

  /** @param nObjects  trajectories to generate (paper: 1,598)
    * @param span      observation span in seconds
    * @param dropRate  probability a record is dropped (creates topological gaps)
    */
  def generate(
      spark: SparkSession,
      space: IndoorSpace,
      nObjects: Int = 1598,
      span: Double = 3600.0,
      dropRate: Double = 0.26,
      seed: Long = 11L,
      recordsPerObject: Int = 76,
  ): DataFrame = {
    import spark.implicits._
    val rng   = new Random(seed)
    val rooms = space.partitions.filterNot(_.isStairway).map(_.id).toVector
    val recs  = ArrayBuffer.empty[Rec]

    for (obj <- 0 until nObjects) {
      var part    = rooms(rng.nextInt(rooms.size))
      var t       = rng.nextDouble() * span * 0.8
      var emitted = 0
      while (emitted < recordsPerObject && t < span) {
        // dwell in `part`, usually emitting one record (occasionally two) —
        // most consecutive records then straddle a partition transition,
        // which is what makes record dropout create topological gaps
        val nDwell = if (rng.nextDouble() < 0.2) 2 else 1
        for (_ <- 0 until nDwell if emitted < recordsPerObject) {
          if (rng.nextDouble() >= dropRate) {
            val r  = space.partitions(part).rect
            val px = r.xMin + rng.nextDouble() * r.width
            val py = r.yMin + rng.nextDouble() * r.height
            recs += Rec(obj.toLong, t, part, px, py, space.partitions(part).floor)
          }
          emitted += 1
          t += 8.0 + rng.nextDouble() * 8.0
        }
        // move through a random leave door
        val doors = space.leaveDoors(part)
        if (doors.nonEmpty) {
          val d    = doors(rng.nextInt(doors.size))
          val next = space.linksFrom((part, d)).map(_.to)
          part = next(rng.nextInt(next.size))
          t += 3.0 + rng.nextDouble() * 5.0
        }
      }
    }
    recs.toSeq.toDF()
  }
}
