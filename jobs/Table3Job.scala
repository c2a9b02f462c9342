package repro.jobs

import repro.exp.TableRunner

/** spark-submit entrypoint reproducing Table 3 (synthetic data comparison).
  *
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [instances] [reps]
  * The table is printed to stdout; BENCH_INSTANCES / BENCH_REPS env vars are
  * honoured when no arguments are given. (The table build itself is
  * driver-side graph search; Spark powers the substrate validation paths.)
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val opts0 = TableRunner.Opts()
    val opts = args.toList match {
      case i :: r :: _ => opts0.copy(instances = i.toInt, reps = r.toInt)
      case i :: Nil    => opts0.copy(instances = i.toInt)
      case Nil         => opts0
    }
    println(TableRunner.table3(opts).rendered)
  }
}
