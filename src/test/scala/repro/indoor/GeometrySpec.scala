package repro.indoor

import org.scalatest.funsuite.AnyFunSuite
import scala.util.Random

class GeometrySpec extends AnyFunSuite {

  private def randPoints(n: Int, seed: Long): Seq[(Point, Point)] = {
    val rng = new Random(seed)
    Seq.fill(n)((Point(rng.nextDouble() * 2e4 - 1e4, rng.nextDouble() * 2e4 - 1e4, 0),
                 Point(rng.nextDouble() * 2e4 - 1e4, rng.nextDouble() * 2e4 - 1e4, 0)))
  }

  test("distance to self is zero") {
    randPoints(200, 1).foreach { case (a, _) => assert(a.dist(a) == 0.0) }
  }

  test("distance is symmetric") {
    randPoints(200, 2).foreach { case (a, b) => assert(math.abs(a.dist(b) - b.dist(a)) < 1e-9) }
  }

  test("distance satisfies the triangle inequality") {
    val rng = new Random(3)
    (0 until 200).foreach { _ =>
      def p() = Point(rng.nextDouble() * 2e4, rng.nextDouble() * 2e4, 0)
      val (a, b, c) = (p(), p(), p())
      assert(a.dist(c) <= a.dist(b) + b.dist(c) + 1e-6)
    }
  }

  test("distance is non-negative") {
    randPoints(200, 4).foreach { case (a, b) => assert(a.dist(b) >= 0.0) }
  }

  test("cross-floor distance is infinite") {
    assert(Point(0, 0, 0).dist(Point(0, 0, 1)).isInfinite)
    assert(Point(5, 3, 2).dist(Point(5, 3, 1)).isInfinite)
  }

  test("distance matches the Euclidean formula") {
    assert(math.abs(Point(0, 0, 0).dist(Point(3, 4, 0)) - 5.0) < 1e-12)
  }

  test("rect area and dims") {
    val r = Rect(1, 2, 4, 8)
    assert(r.width == 3 && r.height == 6 && r.area == 18)
    assert(r.centerX == 2.5 && r.centerY == 5.0)
  }

  test("rect containment is inclusive of boundaries") {
    val r = Rect(0, 0, 10, 10)
    assert(r.contains(0, 0) && r.contains(10, 10) && r.contains(5, 5))
    assert(!r.contains(-0.001, 5) && !r.contains(5, 10.001))
  }

  test("interior points stay inside the rect") {
    val r   = Rect(3, 4, 9, 11)
    val rng = new Random(5)
    (0 until 100).foreach { _ =>
      val p = r.interiorPoint(rng.nextDouble(), rng.nextDouble(), 2)
      assert(r.contains(p.x, p.y) && p.floor == 2)
    }
  }

  test("degenerate rects are rejected") {
    intercept[IllegalArgumentException](Rect(5, 0, 4, 10))
    intercept[IllegalArgumentException](Rect(0, 5, 10, 4))
  }

  test("interiorPoint rejects out-of-range parameters") {
    intercept[IllegalArgumentException](Rect(0, 0, 1, 1).interiorPoint(1.5, 0.5, 0))
  }
}
