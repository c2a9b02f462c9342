package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.crowd.{CrowdModel, ModelState}
import repro.estimator.{FrozenEstimator, LocalEstimator, ZeroEstimator}
import repro.exp.Instances
import repro.indoor.SynthFloorplan

/** Randomized sweeps over search invariants on a full office floor. */
class SearchPropertySpec extends AnyFunSuite {

  private lazy val space = SynthFloorplan.office(1)
  private lazy val model = CrowdModel.synthetic(space, objScale = 900, seed = 53)

  private def exact() = new LocalEstimator(new ModelState(model), exactUpstream = true)

  test("property: crowd-free search distance equals the static shortest distance (many instances)") {
    for (seed <- 1 to 4; q <- Instances.generate(space, 3, 300.0 * seed, seed = seed * 7)) {
      val res   = Search.run(new ZeroEstimator(new ModelState(model)), q.ps, q.pt, 0.0, QueryType.FPQ)
      val dd    = Instances.doorDistances(space, q.ps)
      val hostT = space.host(q.pt)
      val best = space.enterDoors(hostT).map(d => dd(d) + space.doors(d).pos.dist(q.pt))
        .foldLeft(if (space.host(q.ps) == hostT) q.ps.dist(q.pt) else Double.PositiveInfinity)(math.min)
      assert(math.abs(res.cost.dist - best) < 1e-6, s"seed=$seed")
    }
  }

  test("property: all cost components are non-negative and finite on found paths") {
    for (q <- Instances.generate(space, 6, 800, seed = 61); qt <- Seq(QueryType.FPQ, QueryType.LCPQ)) {
      val res = Search.run(exact(), q.ps, q.pt, 0.0, qt)
      assert(res.found)
      assert(res.cost.dist > 0 && res.cost.dist.isFinite)
      assert(res.cost.time > 0 && res.cost.time.isFinite)
      assert(res.cost.contact >= 0 && res.cost.contact.isFinite)
    }
  }

  test("property: travel time is at least distance over speed (ρ > 1)") {
    for (q <- Instances.generate(space, 5, 700, seed = 67)) {
      val res = Search.run(exact(), q.ps, q.pt, 0.0, QueryType.FPQ)
      assert(res.cost.time > res.cost.dist / model.speed, "lagging must slow every path down")
    }
  }

  test("property: under frozen weights, LCPQ's contact never exceeds FPQ's path contact") {
    for (q <- Instances.generate(space, 5, 700, seed = 71)) {
      val fr  = new FrozenEstimator(exact(), 0)
      val fp  = Search.run(fr, q.ps, q.pt, 0.0, QueryType.FPQ)
      val lc  = Search.run(new FrozenEstimator(exact(), 0), q.ps, q.pt, 0.0, QueryType.LCPQ)
      assert(lc.cost.contact <= fp.cost.contact + 1e-9)
    }
  }

  test("property: under frozen weights, FPQ's time never exceeds LCPQ's path time") {
    for (q <- Instances.generate(space, 5, 700, seed = 73)) {
      val fp = Search.run(new FrozenEstimator(exact(), 0), q.ps, q.pt, 0.0, QueryType.FPQ)
      val lc = Search.run(new FrozenEstimator(exact(), 0), q.ps, q.pt, 0.0, QueryType.LCPQ)
      assert(fp.cost.time <= lc.cost.time + 1e-9)
    }
  }

  test("property: a returned path never repeats a door") {
    for (q <- Instances.generate(space, 6, 900, seed = 79); qt <- Seq(QueryType.FPQ, QueryType.LCPQ)) {
      val res = Search.run(exact(), q.ps, q.pt, 0.0, qt)
      assert(res.doorSeq.distinct == res.doorSeq, s"$qt repeated doors: ${res.doorSeq}")
    }
  }

  test("property: longer s2t yields monotonically non-decreasing path distance") {
    val dists = for (s2t <- Seq(400.0, 800.0, 1200.0)) yield {
      val qs = Instances.generate(space, 4, s2t, seed = 83)
      qs.map(q => Search.run(exact(), q.ps, q.pt, 0.0, QueryType.FPQ).cost.dist).sum / qs.size
    }
    assert(dists(0) < dists(1) && dists(1) < dists(2), dists.toString)
  }

  test("property: searches are deterministic (same instance, same result)") {
    val q = Instances.generate(space, 1, 800, seed = 89).head
    val a = Search.run(exact(), q.ps, q.pt, 0.0, QueryType.LCPQ)
    val b = Search.run(exact(), q.ps, q.pt, 0.0, QueryType.LCPQ)
    assert(a.doorSeq == b.doorSeq && a.cost == b.cost)
  }
}
