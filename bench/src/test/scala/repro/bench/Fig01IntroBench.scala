package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.report.Tables
import repro.sched.ExecutorModel
import repro.model.Pricing

/** Fig 1 — the intro simulation: job-scoped IaaS vs FaaS on a 1 TB scan and
  * always-on IaaS vs FaaS/QaaS as a function of query frequency.
  */
class Fig01IntroBench extends AnyFunSuite {

  test("Fig 1a/1b: print the reproduced tables") {
    println(Tables.renderFig1a)
    println()
    println(Tables.renderFig1b)
  }

  test("claim: FaaS services interactive queries, job-scoped IaaS cannot") {
    val faasBest = ExecutorModel.fig1aFaasWorkers
      .map(n => ExecutorModel.faasScan(Pricing.TB, n).latencySeconds).min
    val iaasBest = ExecutorModel.fig1aIaasWorkers
      .map(n => ExecutorModel.jobScopedIaas(Pricing.TB, n).latencySeconds).min
    assert(faasBest < 10 && iaasBest > 120)
  }

  test("claim: at its cost optimum, IaaS is several times cheaper (paper: up to ~10x)") {
    val faasCost = ExecutorModel.fig1aFaasWorkers
      .map(n => ExecutorModel.faasScan(Pricing.TB, n).dollars).min
    val iaasCost = ExecutorModel.fig1aIaasWorkers
      .map(n => ExecutorModel.jobScopedIaas(Pricing.TB, n).dollars).min
    assert(faasCost / iaasCost > 4)
  }

  test("claim: the FaaS sweet spot is sporadic use — break-even at a moderate load") {
    val breakEven = ExecutorModel.faasIaasBreakEvenQueriesPerHour(Pricing.TB, 10.0)
    println(f"FaaS/IaaS break-even: $breakEven%.1f queries/hour")
    assert(breakEven > 5 && breakEven < 100)
  }
}
