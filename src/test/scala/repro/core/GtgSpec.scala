package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.crowd.{CrowdModel, ModelState}
import repro.estimator.{GlobalEstimator, LocalEstimator}
import repro.exp.Instances
import repro.indoor.SynthFloorplan
import repro.testutil.TestModels

class GtgSpec extends AnyFunSuite {

  private lazy val space   = SynthFloorplan.office(1)
  private lazy val model   = CrowdModel.synthetic(space, objScale = 900, seed = 23)
  private lazy val queries = Instances.generate(space, 5, 700, seed = 29)

  private def globalEst() = new GlobalEstimator(new ModelState(model))
  private def localEst()  = new LocalEstimator(new ModelState(model), exactUpstream = true)

  test("GTG with the global estimator matches the crowd-model exact search cost") {
    for (q <- queries; qt <- Seq(QueryType.FPQ, QueryType.LCPQ)) {
      val exact = Search.run(localEst(), q.ps, q.pt, 0.0, qt)
      val gtg   = Gtg.run(globalEst(), q.ps, q.pt, 0.0, qt)
      assert(gtg.found)
      assert(math.abs(exact.cost.time - gtg.cost.time) < 1e-6, s"$qt time")
      assert(math.abs(exact.cost.contact - gtg.cost.contact) < 1e-6, s"$qt contact")
      assert(math.abs(exact.cost.dist - gtg.cost.dist) < 1e-6, s"$qt dist")
    }
  }

  test("GTG returns the same door sequence as the exact search") {
    for (q <- queries.take(3)) {
      val exact = Search.run(localEst(), q.ps, q.pt, 0.0, QueryType.FPQ)
      val gtg   = Gtg.run(globalEst(), q.ps, q.pt, 0.0, QueryType.FPQ)
      assert(exact.doorSeq == gtg.doorSeq)
    }
  }

  test("GTG path is structurally valid") {
    for (q <- queries.take(3)) {
      val gtg = Gtg.run(globalEst(), q.ps, q.pt, 0.0, QueryType.LCPQ)
      assert(PathReplayer.valid(space, q.ps, q.pt, gtg.doorSeq))
    }
  }

  test("GTG generates more queue pushes than the crowd-model search (bigger graph)") {
    var gtgPushes = 0L
    var exPushes  = 0L
    for (q <- queries) {
      gtgPushes += Gtg.run(globalEst(), q.ps, q.pt, 0.0, QueryType.FPQ).stats.pushes
      exPushes += Search.run(localEst(), q.ps, q.pt, 0.0, QueryType.FPQ).stats.pushes
    }
    assert(gtgPushes > exPushes, s"gtg=$gtgPushes exact=$exPushes")
  }

  test("GTG handles a same-partition query") {
    val p   = space.partitions(40)
    val ps  = p.rect.interiorPoint(0.2, 0.2, p.floor)
    val pt  = p.rect.interiorPoint(0.8, 0.8, p.floor)
    val gtg = Gtg.run(globalEst(), ps, pt, 0.0, QueryType.FPQ)
    assert(gtg.found)
  }

  test("GTG works on the tiny hand-built space too") {
    val (sp, m) = TestModels.figure4()
    val ps      = sp.partitions(0).rect.interiorPoint(0.5, 0.5, 0)
    val pt      = sp.partitions(1).rect.interiorPoint(0.5, 0.5, 0)
    val gtg     = Gtg.run(new GlobalEstimator(new ModelState(m)), ps, pt, 0.0, QueryType.FPQ)
    val exact   = Search.run(new LocalEstimator(new ModelState(m), true), ps, pt, 0.0, QueryType.FPQ)
    assert(gtg.found && math.abs(gtg.cost.time - exact.cost.time) < 1e-9)
  }
}
