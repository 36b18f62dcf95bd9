package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.exchange.ExchangeSim
import repro.model.Pricing
import repro.report.{PaperNumbers, Tables}

/** Table 3 + Fig 13 — exchange wall-clock versus Pocket and Locus, and the
  * straggler breakdown on 1 TB / 3 TB.
  */
class Table3ExchangeRuntimeBench extends AnyFunSuite {

  private val gb100 = 100 * Pricing.GB

  test("Table 3 / Fig 13: print the reproduced tables") {
    println(Tables.renderTable3); println()
    println(Tables.renderFig13)
  }

  test("Lambada's numbers land within 20 % of the published 22/15/13 s") {
    for ((p, paper) <- PaperNumbers.Table3Lambada) {
      val ours = ExchangeSim.lambadaTwoLevel(p, gb100).totalSeconds
      assert(math.abs(ours - paper) / paper < 0.20, s"P=$p: $ours vs $paper")
    }
  }

  test("claim: Lambada beats the Pocket S3 baseline ~5x and scales past it") {
    val baseline = ExchangeSim.pocketS3Baseline(250, gb100)
    val ours250  = ExchangeSim.lambadaTwoLevel(250, gb100).totalSeconds
    assert(baseline / ours250 > 3.5, s"paper 5x, ours ${baseline / ours250}")
    // The baseline cannot scale (quadratic requests); Lambada runs at 1000.
    assert(ExchangeSim.lambadaTwoLevel(1000, gb100).totalSeconds < 16)
  }

  test("claim: Lambada beats even Pocket's provisioned VM storage (2.5x/2x/1.4x)") {
    val ratios = Seq(250, 500, 1000).map { p =>
      ExchangeSim.pocketVm(p, gb100) / ExchangeSim.lambadaTwoLevel(p, gb100).totalSeconds
    }
    println(f"pocket-vm / lambada ratios: ${ratios.map(r => f"$r%.1f").mkString(", ")} " +
      "(paper: 2.5, 2.0, 1.4)")
    ratios.foreach(r => assert(r > 1.0))
    assert(ratios.head > ratios.last, "advantage shrinks as Pocket's fleet grows")
  }

  test("claim: 1 TB in 56 s on 1250 workers, 3 TB in 159 s on 2500 workers") {
    val t1 = ExchangeSim.lambadaTwoLevel(1250, Pricing.TB).totalSeconds
    val t3 = ExchangeSim.lambadaTwoLevel(2500, 3 * Pricing.TB).totalSeconds
    println(f"1 TB: $t1%.1f s (paper 56); 3 TB: $t3%.1f s (paper 159)")
    assert(math.abs(t1 - 56) / 56 < 0.15)
    assert(math.abs(t3 - 159) / 159 < 0.20)
  }

  test("claim (Fig 13): stragglers dominate the big run, not the small one") {
    val small = ExchangeSim.lambadaTwoLevel(1250, Pricing.TB)
    val big   = ExchangeSim.lambadaTwoLevel(2500, 3 * Pricing.TB)
    assert(small.totalSeconds < 1.3 * small.lowerBoundSeconds)
    assert(big.totalSeconds > 1.8 * big.lowerBoundSeconds)
    assert(big.writeTailRatio > 2 * small.writeTailRatio)
  }

  test("conclusion claim: queries over >1 TB complete in ~15 s-class time at scale") {
    // 1 TB scanned by 4096 2-GiB workers: the conclusion's "about 15 s".
    val scan = repro.sched.ExecutorModel.faasScan(Pricing.TB, 4096)
    assert(scan.latencySeconds < PaperNumbers.ConclusionTbSeconds)
  }
}
