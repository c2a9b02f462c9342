package repro.estimator

import repro.{Oracle, SparkSpec}
import repro.crowd.ModelState
import repro.testutil.TestModels

class SqlEstimatorSpec extends SparkSpec {

  private lazy val model = TestModels.miniModel(objScale = 8) // starved: rectification triggers

  test("one SQL step matches the sequential global estimator") {
    val seq = new GlobalEstimator(new ModelState(model))
    val (next, _) = SqlEstimator.step(
      SqlEstimator.popsDf(spark, model.initialPop),
      SqlEstimator.expectedFlowsDf(spark, model, 1))
    val got = next.collect().map(r => r.getInt(0) -> r.getDouble(1)).toMap
    for (v <- 0 until model.space.numPartitions) {
      assert(math.abs(got(v) - seq.populationAt(v, 1)) < 1e-9, s"v=$v")
    }
  }

  test("multi-step SQL derivation matches Algorithm 1") {
    val steps = 6
    val seq   = new GlobalEstimator(new ModelState(model))
    val got = SqlEstimator.derive(spark, model, steps)
      .collect().map(r => r.getInt(0) -> r.getDouble(1)).toMap
    for (v <- 0 until model.space.numPartitions) {
      assert(math.abs(got(v) - seq.populationAt(v, steps)) < 1e-9, s"v=$v")
    }
  }

  test("rectified flows: Oracle (DuckDB) agrees with the Catalyst plan") {
    val pops  = SqlEstimator.popsDf(spark, model.initialPop)
    val flows = SqlEstimator.expectedFlowsDf(spark, model, 1)
    val (_, rect) = SqlEstimator.step(pops, flows)
    Oracle.assertEquivalent(rect, SqlEstimator.rectifySql, "pops" -> pops, "flows" -> flows)
  }

  test("new populations: Oracle (DuckDB) agrees with the Catalyst plan") {
    val pops  = SqlEstimator.popsDf(spark, model.initialPop)
    val flows = SqlEstimator.expectedFlowsDf(spark, model, 1)
    val (next, _) = SqlEstimator.step(pops, flows)
    Oracle.assertEquivalent(next, SqlEstimator.newPopSql, "pops" -> pops, "flows" -> flows)
  }

  test("rich populations: SQL step is a pure flow application (no rectification)") {
    val rich = TestModels.miniModel(objScale = 100000)
    val (next, rect) = SqlEstimator.step(
      SqlEstimator.popsDf(spark, rich.initialPop),
      SqlEstimator.expectedFlowsDf(spark, rich, 1))
    // rectified == expected when nothing is starved
    val expected = SqlEstimator.expectedFlowsDf(spark, rich, 1)
      .collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getDouble(3)).toMap
    rect.collect().foreach { r =>
      assert(math.abs(r.getDouble(3) - expected((r.getInt(0), r.getInt(1), r.getInt(2)))) < 1e-12)
    }
    assert(next.collect().length == rich.space.numPartitions)
  }

  test("SQL step conserves total population") {
    val pops  = SqlEstimator.popsDf(spark, model.initialPop)
    val flows = SqlEstimator.expectedFlowsDf(spark, model, 1)
    val (next, _) = SqlEstimator.step(pops, flows)
    val before = model.initialPop.sum
    val after  = next.collect().map(_.getDouble(1)).sum
    assert(math.abs(before - after) < 1e-9)
  }

  test("expectedFlowsDf carries λ at report steps and 0 otherwise") {
    val e = model.edges.find(e => model.reportEvery(e.door) >= 3).get
    val g = 1 // not a report step for that door
    val flows = SqlEstimator.expectedFlowsDf(spark, model, g)
      .collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getDouble(3)).toMap
    assert(flows((e.from, e.to, e.door)) == 0.0)
    val flows0 = SqlEstimator.expectedFlowsDf(spark, model, model.reportEvery(e.door))
      .collect().map(r => (r.getInt(0), r.getInt(1), r.getInt(2)) -> r.getDouble(3)).toMap
    assert(flows0((e.from, e.to, e.door)) == model.lambda(e))
  }
}
