package repro.bench

import java.nio.file.Files
import repro.SparkSpec
import repro.exp.TableRunner

/** Reproduces **Table 4** of the paper: the same twelve-algorithm
  * comparison on the (simulated) real mall dataset — 7 floors, 977
  * partitions, 1613 doors, flows counted from 1,598 synthetic trajectories
  * through the paper's probabilistic method and sampled every 10 s.
  *
  * The rendered table is printed and written to bench/results/table4.md.
  */
class Table4Bench extends SparkSpec {

  test("Table 4: twelve-algorithm comparison on (simulated) real mall data") {
    val res = TableRunner.table4(spark)
    val out = res.rendered
    println(out)
    Files.write(BenchPaths.resultsDir.resolve("table4.md"), out.getBytes)

    val m = res.cols.toMap
    for (q <- Seq("FPQ", "LCPQ")) {
      assert(m(s"$q-NT").timeMs < m(q).timeMs, s"$q: NT must beat exact")
      // GTG belongs to the exact family: it must dominate both approximations
      // and stay within the exact searches' cost regime (our GTG shares the
      // memoized estimator, so unlike the paper's it does not blow past the
      // exact searches by an order of magnitude — see EXPERIMENTS.md)
      assert(m(s"$q-GTG").timeMs > m(s"$q-PP").timeMs, s"$q: GTG must be slower than PP")
      assert(m(s"$q-GTG").timeMs > m(s"$q-NT").timeMs, s"$q: GTG must be slower than NT")
      // regime claim on the deterministic memory counters (wall-clock of the
      // exact family fluctuates with GC in the shared JVM)
      assert(m(s"$q-GTG").memKB > m(s"$q-G").memKB, s"$q: GTG must retain more state than exact-global")
      assert(m(s"$q-GTG").memKB > m(q).memKB * 0.95, s"$q: GTG memory must not undercut exact")
      assert(m(q).hitRate == m(s"$q-G").hitRate)
      repro.exp.Variant.all.foreach { v =>
        val mm = m(q + v.label)
        assert(mm.timeMs > 0 && mm.memKB > 0 && mm.relErr >= 0)
      }
    }
  }
}
