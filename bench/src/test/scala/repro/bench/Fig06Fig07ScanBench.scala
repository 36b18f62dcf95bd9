package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.model.S3Model
import repro.report.{PaperNumbers, Tables}
import repro.scan.ScanModel

/** Figs 6 & 7 — S3 scan characteristics: per-worker bandwidth and the
  * chunk-size / request-cost trade-off behind the scan operator design.
  */
class Fig06Fig07ScanBench extends AnyFunSuite {

  test("Fig 6 / Fig 7: print the reproduced tables") {
    println(Tables.renderFig6); println()
    println(Tables.renderFig7)
  }

  test("claim: large files cap at ~90 MiB/s per worker regardless of connections") {
    assert(S3Model.SustainedMiBps == PaperNumbers.Fig6LargeFileMiBps)
    for (c <- 1 to 8) assert(S3Model.scanMiBps(64.0, c, 3008) <= 90.0 + 1e-9)
  }

  test("claim: small files burst to ~300 MiB/s with several connections on big workers") {
    assert(S3Model.smallObjectMiBps(16.0, 4, 3008) == PaperNumbers.Fig6SmallFileBurstMiBps)
  }

  test("claim: one connection needs ~16 MB chunks, four connections ~1 MB, to saturate") {
    assert(S3Model.scanMiBps(PaperNumbers.Fig7SingleConnSaturationChunkMiB, 1) > 0.85 * 90.0)
    assert(S3Model.scanMiBps(PaperNumbers.Fig7FourConnSaturationChunkMiB, 4) >= 90.0 - 1e-9)
  }

  test("claim: at ~1 MiB chunks request dollars rival worker dollars, below they dominate") {
    val rows = ScanModel.chunkSizeSweep(chunksMiB = Seq(0.25, 1.0), connections = Seq(4))
    val at1MiB = rows.find(_.chunkMiB == 1.0).get.requestToWorkerCostRatio
    val atQuarter = rows.find(_.chunkMiB == 0.25).get.requestToWorkerCostRatio
    println(f"request/worker cost ratio: 1 MiB -> $at1MiB%.2f (paper ~1.7), 0.25 MiB -> $atQuarter%.2f")
    assert(at1MiB > 0.3 && at1MiB < 2.5)
    assert(atQuarter > 1.0, "small chunks: requests dominate the scan cost")
  }
}
