package repro.indoor

/** Basic planar geometry for indoor floorplans.
  *
  * All coordinates are metres. A [[Point]] carries its floor number so that
  * Euclidean distance is only defined within one floor; cross-floor movement
  * goes through explicit stairway partitions whose d2d matrices carry the
  * stair length.
  */
final case class Point(x: Double, y: Double, floor: Int) {

  /** Intra-floor Euclidean distance `|p, q|_E`; infinite across floors
    * (cross-floor motion must use a stairway partition).
    */
  def dist(that: Point): Double =
    if (floor != that.floor) Double.PositiveInfinity
    else math.hypot(x - that.x, y - that.y)
}

/** Axis-aligned rectangle, used for partition footprints. */
final case class Rect(xMin: Double, yMin: Double, xMax: Double, yMax: Double) {
  require(xMax >= xMin && yMax >= yMin, s"degenerate rect $this")

  def width: Double  = xMax - xMin
  def height: Double = yMax - yMin
  def area: Double   = width * height

  def centerX: Double = (xMin + xMax) / 2
  def centerY: Double = (yMin + yMax) / 2

  def contains(x: Double, y: Double): Boolean =
    x >= xMin && x <= xMax && y >= yMin && y <= yMax

  /** A deterministic pseudo-random interior point (for query instances). */
  def interiorPoint(u: Double, v: Double, floor: Int): Point = {
    require(u >= 0 && u <= 1 && v >= 0 && v <= 1)
    Point(xMin + u * width, yMin + v * height, floor)
  }
}
