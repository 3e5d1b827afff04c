package repro.jobs

import repro.bench.Runners

/** spark-submit entrypoint for the single-node benchmark (Table IV +
  * Figs 5-8 analogue). Optional arg: comma-separated `label:records`
  * pairs overriding the default XS-XL sizes.
  *
  * {{{ spark-submit --class repro.jobs.SingleNodeJob repro.jar [XS:20000,S:50000] }}}
  */
object SingleNodeJob {
  def main(args: Array[String]): Unit = {
    val sizes =
      if (args.isEmpty) Runners.singleNodeSizes
      else args(0).split(",").toSeq.map { p =>
        val Array(l, n) = p.split(":"); l -> n.toLong
      }
    val spark = Runners.newSession()
    try {
      Runners.singleNode(spark, sizes).foreach { rep =>
        println(rep.table(total = true))
        println(rep.table(total = false))
      }
      println(Runners.emptyBaseline(spark).table(total = false, exprs = Seq(2, 10)))
    } finally spark.stop()
  }
}
