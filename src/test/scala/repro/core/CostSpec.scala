package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.indoor.CrowdType
import repro.testutil.TestModels

class CostSpec extends AnyFunSuite {

  test("lagging coefficient is always greater than 1") {
    for (d <- Seq(0.0, 0.1, 0.5, 1.0, 5.0); tau <- Seq(CrowdType.Q, CrowdType.R)) {
      assert(CostFunctions.rho(tau, d, 1.0) > 1.0)
    }
  }

  test("lagging coefficient increases monotonically with density") {
    for (tau <- Seq(CrowdType.Q, CrowdType.R)) {
      val vals = (0 to 20).map(i => CostFunctions.rho(tau, i * 0.1, 1.0))
      vals.sliding(2).foreach { case Seq(a, b) => assert(b > a) }
    }
  }

  test("R-crowds lag less than Q-crowds below max density, equal at it") {
    for (d <- Seq(0.1, 0.5, 0.9)) {
      assert(CostFunctions.rho(CrowdType.R, d, 1.0) < CostFunctions.rho(CrowdType.Q, d, 1.0))
    }
    assert(math.abs(CostFunctions.rho(CrowdType.R, 1.0, 1.0) - CostFunctions.rho(CrowdType.Q, 1.0, 1.0)) < 1e-12)
  }

  test("empty-partition lagging coefficient is 1 + e^0 = 2") {
    assert(CostFunctions.rho(CrowdType.Q, 0, 1.0) == 2.0)
    assert(CostFunctions.rho(CrowdType.R, 0, 1.0) == 2.0)
  }

  test("passTime = dist/speed * rho (Eq. 3)") {
    val (_, model) = TestModels.figure4()
    val v          = 0 // R partition, area 100
    val popn       = 25.0
    val expected   = 12.0 / model.speed * CostFunctions.rho(CrowdType.R, 25.0 / 100.0, model.beta)
    assert(math.abs(CostFunctions.passTime(model, v, 12.0, popn) - expected) < 1e-12)
  }

  test("passTime grows with population") {
    val (_, model) = TestModels.figure4()
    val ts         = (0 to 10).map(p => CostFunctions.passTime(model, 0, 10.0, p * 10.0))
    ts.sliding(2).foreach { case Seq(a, b) => assert(b > a) }
  }

  test("R-partition contact is buffer area times density (Eq. 4)") {
    val (_, model) = TestModels.figure4()
    // partition 0: R type, area 100, w = 1
    val contact = CostFunctions.passContact(model, 0, 20.0, 50.0)
    assert(math.abs(contact - 20.0 * 1.0 * (50.0 / 100.0)) < 1e-12)
  }

  test("Q-partition contact is the w-long queue proportion (Eq. 4)") {
    val base  = TestModels.miniModel()
    val qPart = (0 until base.space.numPartitions).find(v => base.tau(v) == CrowdType.Q).get
    val area  = base.area(qPart)
    val dist  = 8.0
    val pop   = 32.0
    val expected = (base.bufferW / dist) * ((pop / area) * area)
    assert(math.abs(CostFunctions.passContact(base, qPart, dist, pop) - expected) < 1e-9)
  }

  test("Q-partition contact is capped at the whole queue for tiny segments") {
    val base  = TestModels.miniModel()
    val qPart = (0 until base.space.numPartitions).find(v => base.tau(v) == CrowdType.Q).get
    assert(CostFunctions.passContact(base, qPart, 0.5, 40.0) == 40.0)
  }

  test("zero population means zero contact") {
    val (_, model) = TestModels.figure4()
    assert(CostFunctions.passContact(model, 0, 15.0, 0.0) == 0.0)
  }

  test("cost addition is element-wise") {
    val c = Cost(1, 2, 3) + Cost(10, 20, 30)
    assert(c == Cost(11, 22, 33))
  }

  test("FPQ ordering minimizes time first, distance second") {
    val ord = Cost.ordering(QueryType.FPQ)
    assert(ord.lt(Cost(100, 5, 0), Cost(1, 6, 0)))   // faster wins despite longer
    assert(ord.lt(Cost(10, 5, 0), Cost(20, 5, 0)))   // same time: shorter wins
    assert(ord.equiv(Cost(10, 5, 3), Cost(10, 5, 3)))
  }

  test("LCPQ ordering minimizes contact first, distance second") {
    val ord = Cost.ordering(QueryType.LCPQ)
    assert(ord.lt(Cost(100, 100, 2), Cost(1, 1, 3))) // fewer contacts wins
    assert(ord.lt(Cost(10, 50, 2), Cost(20, 1, 2)))  // same contact: shorter wins
  }

  test("segmentCost bundles Eq. 3 and Eq. 4 consistently") {
    val (_, model) = TestModels.figure4()
    val c          = CostFunctions.segmentCost(model, 1, 9.0, 14.0)
    assert(c.dist == 9.0)
    assert(c.time == CostFunctions.passTime(model, 1, 9.0, 14.0))
    assert(c.contact == CostFunctions.passContact(model, 1, 9.0, 14.0))
  }
}
