package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.crowd.{CrowdModel, ModelState}
import repro.exp.Instances
import repro.indoor.SynthFloorplan
import repro.sim.{CrowdSim, SimOracleEstimator}

class AdaptiveSpec extends AnyFunSuite {

  private lazy val space   = SynthFloorplan.office(1)
  private lazy val model   = CrowdModel.synthetic(space, objScale = 900, seed = 37)
  private lazy val queries = Instances.generate(space, 4, 600, seed = 41)

  test("adaptive walk terminates on every instance, both query types") {
    val sim = new CrowdSim(model, seed = 1, deterministic = false)
    for (q <- queries; qt <- Seq(QueryType.FPQ, QueryType.LCPQ)) {
      val r = Adaptive.run(model, sim, q.ps, q.pt, 0.0, qt)
      assert(r.found, s"$qt ${q.ps}")
      assert(r.path.head == Search.Src && r.path.last == Search.Tgt)
    }
  }

  test("realized cost is the sum of per-hop truth-based segment costs (>= gold)") {
    val sim = new CrowdSim(model, seed = 2, deterministic = false)
    for (q <- queries; qt <- Seq(QueryType.FPQ, QueryType.LCPQ)) {
      val goldRes = Search.run(new SimOracleEstimator(new ModelState(model), sim), q.ps, q.pt, 0.0, qt)
      val r       = Adaptive.run(model, sim, q.ps, q.pt, 0.0, qt)
      val (pg, pa) = qt match {
        case QueryType.FPQ  => (goldRes.cost.time, r.cost.time)
        case QueryType.LCPQ => (goldRes.cost.contact, r.cost.contact)
      }
      assert(pa >= pg - 1e-6, s"$qt adaptive $pa below gold $pg")
    }
  }

  test("adaptive costs are strictly positive and monotone in path length") {
    val sim = new CrowdSim(model, seed = 3, deterministic = true)
    val r   = Adaptive.run(model, sim, queries.head.ps, queries.head.pt, 0.0, QueryType.FPQ)
    assert(r.cost.time > 0 && r.cost.dist > 0)
    assert(r.path.size >= 2)
  }

  test("stats sum across re-plannings: more hops, more pushes") {
    val sim   = new CrowdSim(model, seed = 4, deterministic = true)
    val short = Instances.generate(space, 1, 300, seed = 43).head
    val long  = Instances.generate(space, 1, 1000, seed = 43).head
    val rs    = Adaptive.run(model, sim, short.ps, short.pt, 0.0, QueryType.FPQ)
    val rl    = Adaptive.run(model, sim, long.ps, long.pt, 0.0, QueryType.FPQ)
    assert(rl.stats.pushes > rs.stats.pushes)
  }

  test("adaptive respects the maxHops guard on impossible walks") {
    val r = Adaptive.run(model, new CrowdSim(model, 5, deterministic = true),
      queries.head.ps, queries.head.pt, 0.0, QueryType.FPQ, maxHops = 1)
    // one hop cannot reach a 600m-away target: must report failure, not loop
    assert(!r.found)
  }
}
