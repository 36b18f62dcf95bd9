package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exchange.{ExchangeAlgo, ExchangeModel}
import repro.report.Tables

/** Table 2 + Fig 9 — request complexity and dollar cost of the exchange
  * algorithms, with the closed forms checked against executed algorithms.
  */
class Table2ExchangeCostBench extends AnyFunSuite {

  test("Table 2 / Fig 9: print the reproduced tables") {
    println(Tables.renderTable2(64)); println()
    println(Tables.renderTable2(729)); println()
    println(Tables.renderFig9)
  }

  test("measured request counts equal the closed forms at P=64 and P=729") {
    for (p <- Seq(64, 729); r <- Tables.table2Rows(p)) {
      assert(r.measuredGets == r.formulaReads, s"P=$p ${r.algo.label}")
      assert(r.measuredPuts == r.formulaWrites, s"P=$p ${r.algo.label}")
      assert(r.measuredLists == r.formulaLists, s"P=$p ${r.algo.label}")
    }
  }

  test("claim: BasicExchange requests cost ~$100 at 4k workers, dwarfing ~$3.3 workers") {
    val p = 4096
    val oneLevel = ExchangeAlgo(1, writeCombining = false)
    val requests = ExchangeModel.requestDollars(oneLevel, p)
    println(f"1l requests at P=4k: $$$requests%.1f (paper ~$$100); " +
      f"workers: $$${ExchangeModel.workerDollarsHigh(p)}%.2f (paper ~$$3.3)")
    assert(requests > 15 * ExchangeModel.workerDollarsHigh(p))
  }

  test("claim: 2l-wc pushes request costs below worker costs in almost all configurations") {
    val twoWc = ExchangeAlgo(2, writeCombining = true)
    for (p <- Seq(256, 1024, 4096)) {
      assert(ExchangeModel.requestDollars(twoWc, p) < ExchangeModel.workerDollarsHigh(p), s"P=$p")
    }
  }

  test("claim: 3l-wc request costs are negligible at every scale") {
    val threeWc = ExchangeAlgo(3, writeCombining = true)
    for (p <- Seq(64, 256, 1024, 4096)) {
      assert(ExchangeModel.requestDollars(threeWc, p) <
        0.1 * ExchangeModel.workerDollarsHigh(p), s"P=$p")
    }
  }
}
