package repro.bench

import org.scalatest.funsuite.AnyFunSuite
import Benchmark._

/** Reproduces the speedup evaluation (Table V + Fig 9): the fixed 'XL'
  * dataset processed by 1-4 workers (local[n] cores; DuckDB threads=n as
  * the Greenplum analogue). MiniMongo skips expression 12 for >1 worker,
  * mirroring MongoDB's unsharded-join limitation from the paper.
  */
class SpeedupBench extends AnyFunSuite {

  test("speedup benchmark — Fig 9 analogue") {
    val report = Runners.speedup()
    val out = report.table(total = true)
    println(out)
    BenchOutput.save("speedup.txt", out)

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

    // same fixed dataset at every worker count: deterministic digests agree
    for (i <- Seq(1, 3, 11, 13)) {
      val digests = report.runs.map(_.exprs(i)).collect {
        case Ok(_, d) => d.toString.toDouble.toLong
      }
      assert(digests.distinct.size == 1, s"digest mismatch expr $i: $digests")
    }
  }
}
