package repro.sim

import org.scalatest.funsuite.AnyFunSuite
import repro.crowd.ModelState
import repro.estimator.GlobalEstimator
import repro.testutil.TestModels

class CrowdSimSpec extends AnyFunSuite {

  test("deterministic simulation equals the exact global estimator at every step") {
    val model = TestModels.miniModel(objScale = 40)
    val sim   = new CrowdSim(model, seed = 1, deterministic = true)
    val est   = new GlobalEstimator(new ModelState(model))
    for (g <- 0 to 20; v <- 0 until model.space.numPartitions) {
      assert(math.abs(sim.populationAt(v, g) - est.populationAt(v, g)) < 1e-9, s"v=$v g=$g")
    }
  }

  test("stochastic simulation conserves total population") {
    val model  = TestModels.miniModel(objScale = 40)
    val sim    = new CrowdSim(model, seed = 2, deterministic = false)
    val total0 = model.initialPop.sum
    for (g <- 1 to 30) {
      val total = (0 until model.space.numPartitions).map(v => sim.populationAt(v, g)).sum
      assert(math.abs(total - total0) < 1e-6, s"step $g")
    }
  }

  test("stochastic populations never go negative") {
    val model = TestModels.miniModel(objScale = 3)
    val sim   = new CrowdSim(model, seed = 3, deterministic = false)
    for (g <- 0 to 30; v <- 0 until model.space.numPartitions) {
      assert(sim.populationAt(v, g) >= 0.0)
    }
  }

  test("simulation is deterministic in its seed") {
    val model = TestModels.miniModel(objScale = 40)
    val a     = new CrowdSim(model, seed = 7, deterministic = false)
    val b     = new CrowdSim(model, seed = 7, deterministic = false)
    for (g <- 0 to 15; v <- 0 until model.space.numPartitions) {
      assert(a.populationAt(v, g) == b.populationAt(v, g))
    }
  }

  test("different seeds realize different worlds") {
    val model = TestModels.miniModel(objScale = 40)
    val a     = new CrowdSim(model, seed = 1, deterministic = false)
    val b     = new CrowdSim(model, seed = 2, deterministic = false)
    val diff = (0 until model.space.numPartitions).exists(v => a.populationAt(v, 10) != b.populationAt(v, 10))
    assert(diff)
  }

  test("stochastic flows track the Poisson rates in expectation") {
    val model = TestModels.miniModel(objScale = 100000) // no rectification
    val nRuns = 60
    val v     = 5
    val g     = 1
    val means = (0 until nRuns).map { s =>
      new CrowdSim(model, seed = s, deterministic = false).populationAt(v, g)
    }
    val detVal = new CrowdSim(model, seed = 0, deterministic = true).populationAt(v, g)
    val avg    = means.sum / nRuns
    // the deterministic step is the expectation of the stochastic one
    assert(math.abs(avg - detVal) / math.max(1.0, detVal) < 0.05, s"avg=$avg det=$detVal")
  }

  test("snapshot returns the full per-partition vector") {
    val model = TestModels.miniModel()
    val sim   = new CrowdSim(model, seed = 4, deterministic = true)
    val snap  = sim.snapshot(5)
    assert(snap.size == model.space.numPartitions)
    (0 until model.space.numPartitions).foreach(v => assert(snap(v) == sim.populationAt(v, 5)))
  }

  test("snapshot(0) is the model's initial population") {
    val model = TestModels.miniModel()
    val sim   = new CrowdSim(model, seed = 5, deterministic = false)
    assert(sim.snapshot(0) == model.initialPop)
  }

  test("oracle estimator exposes the simulated truth") {
    val model = TestModels.miniModel()
    val sim   = new CrowdSim(model, seed = 6, deterministic = false)
    val est   = new SimOracleEstimator(new ModelState(model), sim)
    for (v <- Seq(0, 7); g <- Seq(0, 4, 9)) {
      assert(est.populationAt(v, g) == sim.populationAt(v, g))
    }
  }

  test("lazy extension derives steps on demand only") {
    val model = TestModels.miniModel()
    val sim   = new CrowdSim(model, seed = 8, deterministic = true)
    assert(sim.derivedSteps == 0)
    sim.populationAt(0, 3)
    assert(sim.derivedSteps == 3)
    sim.populationAt(0, 1)
    assert(sim.derivedSteps == 3)
  }
}
