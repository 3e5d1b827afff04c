package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint for the speedup benchmark (Table V + Fig 9
  * analogue). Args: [maxWorkers] [records] — defaults 4 and 200000.
  * Manages its own sessions (one per worker count), so submit with any
  * master; each point runs `local[n]`.
  */
object SpeedupJob {
  def main(args: Array[String]): Unit = {
    val maxWorkers = if (args.length > 0) args(0).toInt else 4
    val records    = if (args.length > 1) args(1).toLong else Runners.multiNodeBaseRecords
    val report = Runners.speedup(1 to maxWorkers, records)
    println(report.table(total = true))
  }
}
