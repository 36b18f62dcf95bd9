package repro.scan

import org.scalatest.funsuite.AnyFunSuite

import repro.core.Queries
import repro.model.WorkerConfig

class ScanModelSpec extends AnyFunSuite {

  private val files = ParquetLayout.lineitemSf1000()
  private val cfg   = WorkerConfig(1792)

  test("a fully pruned file costs only a footer fetch and ~0.1-0.2 s (Fig 11 fast class)") {
    val lastFile = files.last // covers the end of the key range; Q6 prunes it
    val scan = ScanModel.workerScan(Seq(lastFile), Queries.Q6Profile, cfg)
    assert(scan.filesPruned == 1 && scan.filesScanned == 0)
    assert(scan.getRequests == 1, "only the footer read")
    assert(scan.seconds >= 0.1 && scan.seconds <= 0.25, s"${scan.seconds}")
    assert(scan.bytesDownloaded == 0)
  }

  test("an unpruned Q1 file takes 2-3 s at 1792 MiB (Fig 11 slow class)") {
    val scan = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, cfg)
    assert(scan.filesScanned == 1)
    assert(scan.seconds >= 2.0 && scan.seconds <= 3.0, s"${scan.seconds}")
  }

  test("scanning GZIP Parquet is CPU-bound at one vCPU (Section 5.2)") {
    // At 1792 MiB the compute term must dominate the download term.
    val bytes = files.head.rowGroups.map(_.bytesOf(Queries.Q1Columns)).sum
    val download = bytes / repro.model.Pricing.MiB / 90.0
    val cpu      = bytes / repro.model.Pricing.MiB /
      (ScanModel.CpuMiBpsPerVCpu * cfg.relativeThroughput(2))
    assert(cpu > download)
  }

  test("a 512 MiB worker is several times slower than 1792 MiB on the same file") {
    val slow = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, WorkerConfig(512))
    val fast = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, cfg)
    val ratio = slow.seconds / fast.seconds
    assert(ratio > 3.0 && ratio < 5.0, s"ratio=$ratio")
  }

  test("memory beyond 1792 MiB buys little extra speed (Fig 10a)") {
    val base = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, cfg)
    val big  = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, WorkerConfig(3008))
    assert(big.seconds <= base.seconds)
    assert(big.seconds > 0.85 * base.seconds, "at most ~15 % faster: download-bound")
  }

  test("request count: one footer plus one GET per used column chunk (8 MiB ranges)") {
    val scan = ScanModel.workerScan(Seq(files.head), Queries.Q1Profile, cfg)
    val expected = 1L + files.head.rowGroups.iterator.flatMap(_.chunks)
      .filter(c => Queries.Q1Columns.contains(c.column))
      .map(c => math.max(1L, (c.bytes + ScanModel.DownloadChunkBytes - 1) /
        ScanModel.DownloadChunkBytes))
      .sum
    assert(scan.getRequests == expected)
  }

  test("Q6 downloads fewer bytes per scanned file than Q1 (fewer attributes)") {
    val midFile = files(files.size * 4 / 10) // inside Q6's 1994 window
    val q1 = ScanModel.workerScan(Seq(midFile), Queries.Q1Profile, cfg)
    val q6 = ScanModel.workerScan(Seq(midFile), Queries.Q6Profile, cfg)
    assert(q6.filesScanned == 1)
    assert(q6.bytesDownloaded < q1.bytesDownloaded)
    assert(q6.seconds < q1.seconds, "Section 5.3: Q1 slightly slower per worker")
  }

  test("F files per worker cost ~F times the single-file time") {
    val one  = ScanModel.workerScan(files.take(1), Queries.Q1Profile, cfg)
    val four = ScanModel.workerScan(files.take(4), Queries.Q1Profile, cfg)
    val ratio = four.seconds / one.seconds
    assert(ratio > 3.3 && ratio < 4.3, s"ratio=$ratio")
  }

  test("worker scan rejects an empty file list") {
    intercept[IllegalArgumentException](
      ScanModel.workerScan(Seq.empty, Queries.Q1Profile, cfg))
  }

  test("chunk sweep covers the Fig 7 grid and bandwidths are capped at 90 MiB/s") {
    val rows = ScanModel.chunkSizeSweep()
    assert(rows.size == 32)
    assert(rows.forall(_.bandwidthMiBps <= 90.0 + 1e-9))
    assert(rows.forall(_.requestUsdPer1000 > 0))
  }

  test("query profile validation") {
    intercept[IllegalArgumentException](QueryProfile("bad", Set("c"), 0.5, 0.4, 0.1))
    intercept[IllegalArgumentException](QueryProfile("bad", Set("c"), 0.0, 1.0, 1.5))
  }

  test("usedFraction ignores unknown columns") {
    val p = QueryProfile("x", Set("l_quantity", "no_such_column"), 0, 1, 0.5)
    assert(p.usedFraction(ParquetLayout.LineitemColumnFractions) ==
      ParquetLayout.LineitemColumnFractions("l_quantity"))
  }
}
