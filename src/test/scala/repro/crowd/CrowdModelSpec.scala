package repro.crowd

import org.scalatest.funsuite.AnyFunSuite
import repro.indoor.SynthFloorplan
import scala.util.Random

class CrowdModelSpec extends AnyFunSuite {

  private lazy val space = SynthFloorplan.office(1)
  private lazy val model = CrowdModel.synthetic(space, objScale = 900, ti = 10, seed = 5)

  test("model covers every directed link with an edge") {
    assert(model.edges.size == space.links.size)
    assert(model.edges.toSet == space.links.map(l => EdgeKey(l.from, l.to, l.door)).toSet)
  }

  test("λ values respect the paper's range [0, 3]") {
    model.lambda.values.foreach(l => assert(l >= 0 && l <= 3.0))
  }

  test("hallway doors run hotter than room doors on average") {
    val isCorr = (v: Int) => space.partitions(v).rect.height <= 30 || space.partitions(v).isStairway
    val (hall, room) = model.edges.partition(e => isCorr(e.from) && isCorr(e.to))
    val hallAvg = hall.map(model.lambda).sum / hall.size
    val roomAvg = room.map(model.lambda).sum / room.size
    assert(hallAvg > roomAvg)
  }

  test("report periods are 1..5 grid steps") {
    model.reportEvery.foreach(p => assert(p >= 1 && p <= 5))
  }

  test("every door reports at step 0 and at its period multiples") {
    (0 until space.numDoors).foreach { d =>
      assert(model.doorReportsAt(d, 0))
      assert(model.doorReportsAt(d, model.reportEvery(d)))
      if (model.reportEvery(d) > 1) assert(!model.doorReportsAt(d, 1) || model.reportEvery(d) == 1)
    }
  }

  test("expectedFlow is zero between reports and λ at reports") {
    val e = model.edges.find(e => model.reportEvery(e.door) == 5).get
    assert(model.expectedFlow(e, 5) == model.lambda(e))
    (1 to 4).foreach(g => assert(model.expectedFlow(e, g) == 0.0))
  }

  test("gridStep/gridTime round-trip") {
    assert(model.gridStep(model.gridTime(7)) == 7)
    assert(model.gridStep(model.t0) == 0)
    assert(model.gridStep(model.t0 + 10.0 * 3 + 4) == 3)
    assert(model.gridStep(model.t0 - 100) == 0) // clamped
  }

  test("initial populations are within [0, |o|] and capacity") {
    model.initialPop.zipWithIndex.foreach { case (p, v) =>
      assert(p >= 0 && p <= 900 && p <= model.capacity(v) + 1e-9)
    }
  }

  test("updateStepsBetween counts the union of the partition doors' reports") {
    val v       = 0
    val periods = space.allDoors(v).map(model.reportEvery)
    val manual  = (1 to 30).count(g => periods.exists(p => g % p == 0))
    assert(model.updateStepsBetween(v, 0, 30) == manual)
    assert(model.updateStepsBetween(v, 0, 0) == 0)
  }

  test("historyStats computes mean and stddev of the net-flow history") {
    val v         = 3
    val h         = model.historyNet(v)
    val (mu, sig) = model.historyStats(v)
    val muManual  = h.sum / h.size
    assert(math.abs(mu - muManual) < 1e-12)
    val sigManual = math.sqrt(h.map(x => (x - muManual) * (x - muManual)).sum / h.size)
    assert(math.abs(sig - sigManual) < 1e-12)
  }

  test("withObservation shifts the grid origin but keeps report phases") {
    val obs = model.withObservation(IndexedSeq.fill(space.numPartitions)(1.0), gNow = 7)
    assert(obs.t0 == model.gridTime(7))
    (0 until space.numDoors).foreach { d =>
      (0 to 20).foreach { g =>
        assert(obs.doorReportsAt(d, g) == model.doorReportsAt(d, g + 7))
      }
    }
    assert(obs.initialPop.forall(_ == 1.0))
  }

  test("synthetic model is deterministic in the seed") {
    val a = CrowdModel.synthetic(space, seed = 9)
    val b = CrowdModel.synthetic(space, seed = 9)
    assert(a.lambda == b.lambda && a.initialPop == b.initialPop && a.reportEvery == b.reportEvery)
  }

  test("ModelState instruments derivation counts") {
    val st = new ModelState(model)
    assert(st.popDerivations == 0 && st.flowDerivations == 0)
    st.putFlow(model.edges.head, 1, 2.0)
    st.putPop(0, 1, 5.0)
    assert(st.popDerivations == 1 && st.flowDerivations == 1)
    assert(st.getFlow(model.edges.head, 1).contains(2.0) && st.getPop(0, 1).contains(5.0))
  }
}

class DoorFlowSpec extends AnyFunSuite {

  test("fitLambda is the sample mean (Poisson MLE)") {
    assert(DoorFlow.fitLambda(Seq(1, 2, 3, 4, 5).map(_.toDouble)) == 3.0)
    assert(DoorFlow.fitLambda(Seq(0.0, 0.0)) == 0.0)
  }

  test("fitLambda clamps negative means to zero and rejects empty input") {
    assert(DoorFlow.fitLambda(Seq(-1.0, -3.0)) == 0.0)
    intercept[IllegalArgumentException](DoorFlow.fitLambda(Seq.empty))
  }

  test("samplePoisson(0) is always 0") {
    val rng = new Random(1)
    (0 until 100).foreach(_ => assert(DoorFlow.samplePoisson(0.0, rng) == 0))
  }

  test("samplePoisson matches mean and variance of Poisson(λ)") {
    val rng = new Random(2)
    for (lambda <- Seq(0.5, 1.5, 3.0)) {
      val n  = 20000
      val xs = Seq.fill(n)(DoorFlow.samplePoisson(lambda, rng).toDouble)
      val m  = xs.sum / n
      val v  = xs.map(x => (x - m) * (x - m)).sum / n
      assert(math.abs(m - lambda) < 0.1, s"mean $m for λ=$lambda")
      assert(math.abs(v - lambda) < 0.2, s"var $v for λ=$lambda")
    }
  }

  test("samplePoisson large-λ branch stays near the mean") {
    val rng = new Random(3)
    val xs  = Seq.fill(5000)(DoorFlow.samplePoisson(100.0, rng).toDouble)
    val m   = xs.sum / xs.size
    assert(math.abs(m - 100.0) < 1.5)
    xs.foreach(x => assert(x >= 0))
  }

  test("samplePoisson rejects negative rates") {
    intercept[IllegalArgumentException](DoorFlow.samplePoisson(-1.0, new Random(4)))
  }
}
