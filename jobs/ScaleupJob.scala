package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint for the scaleup benchmark (Table V + Fig 10
  * analogue). Args: [maxWorkers] [recordsPerWorker] — defaults 4 and
  * 200000. Each point runs `local[n]` over n × recordsPerWorker records.
  */
object ScaleupJob {
  def main(args: Array[String]): Unit = {
    val maxWorkers = if (args.length > 0) args(0).toInt else 4
    val perWorker  = if (args.length > 1) args(1).toLong else Runners.multiNodeBaseRecords
    val report = Runners.scaleup(1 to maxWorkers, perWorker)
    println(report.table(total = true))
  }
}
