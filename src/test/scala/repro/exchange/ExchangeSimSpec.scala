package repro.exchange

import org.scalatest.funsuite.AnyFunSuite

import repro.model.Pricing
import repro.report.PaperNumbers

class ExchangeSimSpec extends AnyFunSuite {

  private val gb100 = 100 * Pricing.GB

  private def within(actual: Double, paper: Double, tol: Double): Unit =
    assert(math.abs(actual - paper) / paper <= tol,
      f"ours $actual%.1f vs paper $paper%.1f (tol ${tol * 100}%.0f%%)")

  test("Table 3: Lambada 100 GB at 250/500/1000 workers within 20 % of paper") {
    within(ExchangeSim.lambadaTwoLevel(250, gb100).totalSeconds, 22.0, 0.20)
    within(ExchangeSim.lambadaTwoLevel(500, gb100).totalSeconds, 15.0, 0.20)
    within(ExchangeSim.lambadaTwoLevel(1000, gb100).totalSeconds, 13.0, 0.20)
  }

  test("Table 3: Pocket over VM storage within 25 % of paper") {
    within(ExchangeSim.pocketVm(250, gb100), 58.0, 0.25)
    within(ExchangeSim.pocketVm(500, gb100), 28.0, 0.25)
    within(ExchangeSim.pocketVm(1000, gb100), 18.0, 0.25)
  }

  test("Table 3: Pocket's S3 baseline at 250 workers within 25 % of 98 s") {
    within(ExchangeSim.pocketS3Baseline(250, gb100), 98.0, 0.25)
  }

  test("Table 3: Locus band overlaps the published 80-140 s") {
    val (lo, hi) = ExchangeSim.locus(gb100)
    assert(lo < 140 && hi > 80, s"($lo, $hi)")
  }

  test("Table 3 ordering: Lambada beats Pocket-on-S3 by ~5x at 250 workers") {
    val ratio = ExchangeSim.pocketS3Baseline(250, gb100) /
      ExchangeSim.lambadaTwoLevel(250, gb100).totalSeconds
    assert(ratio > 3.5 && ratio < 6.0, s"paper: 5x, ours ${ratio}x")
  }

  test("Table 3 ordering: Lambada beats Pocket-on-VMs at every fleet size") {
    for (p <- Seq(250, 500, 1000)) {
      assert(ExchangeSim.lambadaTwoLevel(p, gb100).totalSeconds <
        ExchangeSim.pocketVm(p, gb100), s"p=$p")
    }
  }

  test("Table 3 ordering: Lambada at 250 workers is ~4x faster than Locus' best") {
    val (locusBest, _) = ExchangeSim.locus(gb100)
    val ratio = locusBest / ExchangeSim.lambadaTwoLevel(250, gb100).totalSeconds
    assert(ratio > 2.5 && ratio < 5.0, s"paper: ~4x, ours ${ratio}x")
  }

  test("1 TB on 1250 workers within 15 % of the paper's 56 s") {
    within(ExchangeSim.lambadaTwoLevel(1250, Pricing.TB).totalSeconds, 56.0, 0.15)
  }

  test("3 TB on 2500 workers within 20 % of the paper's 159 s") {
    within(ExchangeSim.lambadaTwoLevel(2500, 3 * Pricing.TB).totalSeconds, 159.0, 0.20)
  }

  test("Fig 13: on 1 TB the fastest worker runs ~85 % of the end-to-end time") {
    val run = ExchangeSim.lambadaTwoLevel(1250, Pricing.TB)
    val frac = run.fastestWorkerSeconds / run.totalSeconds
    assert(frac > 0.78 && frac < 0.97, s"paper ~0.85, ours $frac")
  }

  test("Fig 13: on 3 TB total execution is >2x the per-phase lower bound") {
    val run = ExchangeSim.lambadaTwoLevel(2500, 3 * Pricing.TB)
    assert(run.totalSeconds > 1.8 * run.lowerBoundSeconds,
      s"${run.totalSeconds} vs bound ${run.lowerBoundSeconds}")
  }

  test("Fig 13: write-phase tail grows from ~1.3x (1 TB) to ~4x (3 TB)") {
    val small = ExchangeSim.lambadaTwoLevel(1250, Pricing.TB).writeTailRatio
    val big   = ExchangeSim.lambadaTwoLevel(2500, 3 * Pricing.TB).writeTailRatio
    assert(small > 1.1 && small < 1.7, s"paper ~1.3, ours $small")
    assert(big > 3.0 && big < 5.5, s"paper ~4, ours $big")
  }

  test("Fig 13: the five data phases have equal fastest times (same volume, full bandwidth)") {
    val run = ExchangeSim.lambadaTwoLevel(1250, Pricing.TB)
    val dataPhases = Seq("read-input", "write-1", "read-1", "write-2", "read-2")
      .map(run.phaseFastest)
    assert(dataPhases.max / dataPhases.min < 1.05)
  }

  test("waiting is never shorter than one S3 round-trip (Section 5.5)") {
    val run = ExchangeSim.lambadaTwoLevel(500, gb100)
    assert(run.phaseFastest("wait-1") >= repro.model.S3Model.RequestLatencySeconds)
    assert(run.phaseFastest("wait-2") >= repro.model.S3Model.RequestLatencySeconds)
  }

  test("demand ratio exceeds 1 only for fleets beyond the S3 backend capacity") {
    assert(ExchangeSim.demandRatio(1000) < 1.0)
    assert(ExchangeSim.demandRatio(1250) > 1.0)
    assert(ExchangeSim.demandRatio(2500) > 2.0)
  }

  test("more workers reduce exchange time on a fixed dataset (until contention)") {
    val t250  = ExchangeSim.lambadaTwoLevel(250, gb100).totalSeconds
    val t500  = ExchangeSim.lambadaTwoLevel(500, gb100).totalSeconds
    val t1000 = ExchangeSim.lambadaTwoLevel(1000, gb100).totalSeconds
    assert(t250 > t500 && t500 > t1000)
  }

  test("the simulation is deterministic in its seed") {
    val a = ExchangeSim.lambadaTwoLevel(500, gb100, seed = 5)
    val b = ExchangeSim.lambadaTwoLevel(500, gb100, seed = 5)
    val c = ExchangeSim.lambadaTwoLevel(500, gb100, seed = 6)
    assert(a.totalSeconds == b.totalSeconds)
    assert(a.totalSeconds != c.totalSeconds)
  }

  test("tiny fleets are rejected") {
    intercept[IllegalArgumentException](ExchangeSim.lambadaTwoLevel(2, gb100))
  }
}
