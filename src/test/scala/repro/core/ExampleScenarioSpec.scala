package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.crowd.{CrowdModel, EdgeKey, ModelState}
import repro.estimator.{LocalEstimator, ZeroEstimator}
import repro.indoor._

/** A hand-built two-route scenario in the spirit of the paper's Examples
  * 1–2 (Figure 1): the topologically shortest route crosses a crowded
  * partition; a longer detour is empty. Crowd-aware FPQ/LCPQ must take
  * the detour while plain shortest-path routing takes the direct route.
  */
class ExampleScenarioSpec extends AnyFunSuite {

  // S(0) -> X(1, crowded, short) -> T(3); S -> Y(2, empty, long) -> T
  private def build(crowdX: Double, tauX: CrowdType = CrowdType.R): (IndoorSpace, CrowdModel) = {
    val partitions = IndexedSeq(
      Partition(0, Rect(0, 0, 10, 30), 0, CrowdType.R),    // S
      Partition(1, Rect(10, 20, 30, 30), 0, tauX),         // X: direct, area 200
      Partition(2, Rect(10, 0, 30, 10), 0, CrowdType.R),   // Y: detour, area 200
      Partition(3, Rect(30, 0, 40, 30), 0, CrowdType.R),   // T
    )
    val doors = IndexedSeq(
      Door(0, Point(10, 25, 0)), // S -> X
      Door(1, Point(30, 25, 0)), // X -> T
      Door(2, Point(10, 2, 0)),  // S -> Y  (detour geometry: longer walk)
      Door(3, Point(30, 2, 0)),  // Y -> T
    )
    val links = IndexedSeq(
      DoorLink(0, 0, 1), DoorLink(0, 1, 0),
      DoorLink(1, 1, 3), DoorLink(1, 3, 1),
      DoorLink(2, 0, 2), DoorLink(2, 2, 0),
      DoorLink(3, 2, 3), DoorLink(3, 3, 2),
    )
    val space = new IndoorSpace(partitions, doors, links, Map.empty)
    space.validate()
    val model = new CrowdModel(
      space,
      space.links.map(l => EdgeKey(l.from, l.to, l.door) -> 0.0).toMap, // static world
      reportEvery = IndexedSeq.fill(4)(1), ti = 10, t0 = 0.0,
      initialPop = IndexedSeq(0.0, crowdX, 0.0, 0.0),
      historyNet = IndexedSeq.fill(4)(Vector.fill(5)(0.0)),
    )
    (space, model)
  }

  private val ps = Point(5, 25, 0)  // in S, near the direct door
  private val pt = Point(35, 25, 0) // in T, near the direct exit

  private def run(model: CrowdModel, qt: QueryType) =
    Search.run(new LocalEstimator(new ModelState(model), exactUpstream = true), ps, pt, 0.0, qt)

  test("crowd-free routing takes the direct (shortest) route through X") {
    val (_, model) = build(crowdX = 180.0)
    val res        = Search.run(new ZeroEstimator(new ModelState(model)), ps, pt, 0.0, QueryType.FPQ)
    assert(res.doorSeq == Vector(0, 1), s"got ${res.doorSeq}")
  }

  test("Example 1: FPQ detours around the crowded partition") {
    // density 3 in X -> ρ_R = 1 + e^9: the direct route becomes hopeless
    val (_, model) = build(crowdX = 600.0)
    val res        = run(model, QueryType.FPQ)
    assert(res.doorSeq == Vector(2, 3), s"expected detour, got ${res.doorSeq}")
  }

  test("FPQ stays on the direct route when X is only mildly crowded") {
    val (_, model) = build(crowdX = 20.0) // density 0.1: negligible lag
    val res        = run(model, QueryType.FPQ)
    assert(res.doorSeq == Vector(0, 1))
  }

  test("Example 2: LCPQ always avoids the populated partition entirely") {
    for (crowd <- Seq(20.0, 180.0)) {
      val (_, model) = build(crowdX = crowd)
      val res        = run(model, QueryType.LCPQ)
      assert(res.doorSeq == Vector(2, 3), s"crowd=$crowd got ${res.doorSeq}")
      assert(res.cost.contact < 1e-9)
    }
  }

  test("a Q-partition lags harder than an R-partition at the same density") {
    val (_, rModel) = build(crowdX = 150.0, tauX = CrowdType.R)
    val (_, qModel) = build(crowdX = 150.0, tauX = CrowdType.Q)
    val rTime = CostFunctions.passTime(rModel, 1, 20.0, 150.0)
    val qTime = CostFunctions.passTime(qModel, 1, 20.0, 150.0)
    assert(qTime > rTime)
  }

  test("the detour threshold moves with the crowd: crossing density flips the FPQ choice") {
    // find the flip point by scanning crowd sizes; it must be monotone
    // (analytically the flip is near pop ≈ 250 for this geometry)
    val choices = Seq(0.0, 150.0, 300.0, 600.0).map { c =>
      val (_, model) = build(crowdX = c)
      run(model, QueryType.FPQ).doorSeq == Vector(0, 1) // direct?
    }
    // once the search switches to the detour it never switches back
    assert(choices.zip(choices.tail).forall { case (a, b) => a || !b })
    assert(choices.head && !choices.last)
  }

  test("reported FPQ time equals the hand-computed detour cost") {
    val (_, model) = build(crowdX = 600.0)
    val res        = run(model, QueryType.FPQ)
    // detour: S(ps->d2) + Y(d2->d3) + T(d3->pt), all at density 0 => rho = 2
    val dist = ps.dist(Point(10, 2, 0)) + 20.0 + Point(30, 2, 0).dist(pt)
    val expected = dist / model.speed * 2.0
    assert(math.abs(res.cost.time - expected) < 1e-9)
  }
}
