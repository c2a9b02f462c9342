package repro.exp

import org.scalatest.funsuite.AnyFunSuite

/** Integration smoke of the full Table-3 harness at miniature scale. */
class TableRunnerSpec extends AnyFunSuite {

  private lazy val result = TableRunner.table3(TableRunner.Opts(
    instances = 2, reps = 1, floors = 1, s2t = 500, maxGrid = 300, deterministicWorld = true))

  test("table3 runner produces all twelve algorithm columns") {
    assert(result.cols.map(_._1) == Seq(
      "FPQ", "FPQ-G", "FPQ-PP", "FPQ-NT", "FPQ-GTG", "FPQ-A",
      "LCPQ", "LCPQ-G", "LCPQ-PP", "LCPQ-NT", "LCPQ-GTG", "LCPQ-A"))
  }

  test("exact variants score perfect accuracy in the deterministic world") {
    val m = result.cols.toMap
    for (c <- Seq("FPQ", "FPQ-G", "LCPQ", "LCPQ-G")) {
      assert(m(c).hitRate == 100.0, c)
      assert(m(c).relErr < 1e-9, c)
    }
  }

  test("every column carries positive time and memory") {
    result.cols.foreach { case (label, m) =>
      assert(m.timeMs > 0 && m.memKB > 0, label)
    }
  }

  test("rendered table carries the setting and the metric rows") {
    val r = result.rendered
    assert(r.contains("Table 3") && r.contains("floors=1"))
    assert(r.contains("Running Time (ms)") && r.contains("Relative Error"))
  }
}
