package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import Benchmark._

/** Reproduces the scaleup evaluation (Table V + Fig 10): dataset size
  * grows in proportion to the worker count (n × 'XL' records on n
  * workers, n = 1..4).
  */
class ScaleupBench extends AnyFunSuite {

  test("scaleup benchmark — Fig 10 analogue") {
    val report = Runners.scaleup()
    val out = report.table(total = true)
    println(out)
    BenchOutput.save("scaleup.txt", out)

    report.runs.foreach { run =>
      assert(run.creation.isInstanceOf[Ok], s"${run.system} creation")
      val workers = run.system.split("w=").last.stripSuffix("]").toInt
      (1 to 13).foreach { i =>
        if (i == 12 && run.system.contains("MiniMongo") && workers > 1)
          assert(run.exprs(i) == Skipped, s"${run.system} expr 12 should be skipped")
        else
          assert(run.exprs(i).isInstanceOf[Ok], s"${run.system} expr $i")
      }
    }

    // counts scale linearly with the data: expr 1 digest = workers × base
    val base = Runners.multiNodeBaseRecords
    report.runs.foreach { run =>
      val workers = run.system.split("w=").last.stripSuffix("]").toInt
      val n = run.exprs(1).asInstanceOf[Ok].digest.toString.toDouble.toLong
      assert(n == base * workers, s"${run.system}: expr1=$n, expected ${base * workers}")
    }
  }
}
