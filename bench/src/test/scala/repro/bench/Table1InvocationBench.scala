package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.invoke.Invoker
import repro.model.LambdaModel
import repro.report.{PaperNumbers, Tables}

/** Table 1 + Fig 4 + Fig 5 — invocation characteristics and intra-worker
  * parallelism.
  */
class Table1InvocationBench extends AnyFunSuite {

  test("Table 1 / Fig 4 / Fig 5: print the reproduced tables") {
    println(Tables.renderTable1); println()
    println(Tables.renderFig4); println()
    println(Tables.renderFig5)
  }

  test("Table 1: concurrent invocation rates match the paper exactly") {
    Tables.table1Rows.foreach { r =>
      assert(r.concurrentRate == PaperNumbers.Table1(r.region)._2, r.region)
    }
  }

  test("claim: the driver alone needs 3.4-4.4 s for 1000 workers") {
    val times = LambdaModel.Regions.map(r => Invoker.driverOnlyIssueSeconds(1000, r))
    assert(times.min >= PaperNumbers.DriverOnly1000WorkersSecondsRange._1 - 0.1)
    assert(times.max <= PaperNumbers.DriverOnly1000WorkersSecondsRange._2 + 0.2)
  }

  test("claim (abstract): the propagation tree spawns 4k functions in ~3 s") {
    val tl = Invoker.twoLevel(4096, LambdaModel.Eu, cold = true)
    assert(tl.makespan < PaperNumbers.AbstractInvocationClaim._2 + 1.0)
    assert(tl.lastInitiatedAt < PaperNumbers.Fig5LastInitiatedSeconds + 0.5)
  }

  test("claim (Fig 4): relative throughput tops out at ~1.67x on the largest worker") {
    val top = Tables.fig4Rows().map(_.relative).max
    assert(math.abs(top - PaperNumbers.Fig4MaxRelativeThroughput) < 0.05)
  }
}
