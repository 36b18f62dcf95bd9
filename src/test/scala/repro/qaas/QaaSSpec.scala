package repro.qaas

import org.scalatest.funsuite.AnyFunSuite

import repro.model.Pricing

class QaaSSpec extends AnyFunSuite {

  private val parquetSf1k  = 151.0 * Pricing.GiB
  private val parquetSf10k = 10 * parquetSf1k

  test("BigQuery's format takes 823 GiB for the SF 1000 table (Section 5.4.1)") {
    assert(math.abs(parquetSf1k * BigQuery.FormatExpansion / Pricing.GiB - 823.0) < 1.0)
    assert(BigQuery.FormatExpansion > 5.0, "over 5x larger than Parquet")
  }

  test("BigQuery load takes ~40 min at SF 1k and ~6.7 h at SF 10k") {
    val load1k  = BigQuery.loadSeconds(parquetSf1k) / 60.0
    val load10k = BigQuery.loadSeconds(parquetSf10k) / 3600.0
    assert(math.abs(load1k - 40.0) < 4.0, s"$load1k min")
    assert(math.abs(load10k - 6.7) < 0.6, s"$load10k h")
  }

  test("BigQuery hot latencies at SF 1k match the published 3.9 s / 1.6 s") {
    assert(BigQuery.hotSeconds(BigQuery.Q1, 1000) == 3.9)
    assert(BigQuery.hotSeconds(BigQuery.Q6, 1000) == 1.6)
  }

  test("BigQuery scales sublinearly: 10x data costs far less than 10x time") {
    val r1 = BigQuery.hotSeconds(BigQuery.Q1, 10000) / BigQuery.hotSeconds(BigQuery.Q1, 1000)
    val r6 = BigQuery.hotSeconds(BigQuery.Q6, 10000) / BigQuery.hotSeconds(BigQuery.Q6, 1000)
    assert(r1 > 1.0 && r1 < 5.0)
    assert(r6 > 1.0 && r6 < 2.5)
  }

  test("BigQuery cold latency is dominated by the ETL load") {
    val cold = BigQuery.coldSeconds(BigQuery.Q1, 1000, parquetSf1k)
    assert(cold > BigQuery.loadSeconds(parquetSf1k))
    assert(cold < BigQuery.loadSeconds(parquetSf1k) + 10)
  }

  test("BigQuery charges whole columns regardless of selectivity (Section 5.4.1)") {
    // Same used columns, any selectivity: identical bill.
    val usd = BigQuery.dollars(parquetSf1k * 0.41)
    assert(usd > 1.0, s"Q1-at-SF1k-class query costs dollars, got $usd")
  }

  test("Athena latency grows linearly in the bytes read (Section 5.4.2)") {
    val t1  = Athena.latencySeconds(100 * Pricing.GiB, 0.0)
    val t10 = Athena.latencySeconds(1000 * Pricing.GiB, 0.0)
    assert((t10 - Athena.OverheadSeconds) / (t1 - Athena.OverheadSeconds) == 10.0)
  }

  test("Athena's pushdown shortens highly prunable queries") {
    val noPrune = Athena.latencySeconds(100 * Pricing.GiB, 0.0)
    val pruned  = Athena.latencySeconds(100 * Pricing.GiB, 0.85)
    assert(pruned < noPrune)
    assert(pruned > Athena.OverheadSeconds)
  }

  test("Athena pushes selections into the cost model: Q6 pays only 2 % (Section 5.4.3)") {
    val usedBytes = 49.8 * Pricing.GiB
    val q6 = Athena.dollars(usedBytes, rowSelectivity = 0.02)
    val q1 = Athena.dollars(usedBytes, rowSelectivity = 0.98)
    assert(math.abs(q1 / q6 - 49.0) < 1e-6)
  }

  test("Athena dollars follow $5/TiB exactly") {
    assert(math.abs(Athena.dollars(Pricing.TiB, 1.0) - 5.0) < 1e-9)
  }

  test("a fully selective filter makes an Athena query free (Section 5.4.3)") {
    assert(Athena.dollars(100 * Pricing.GiB, 0.0) == 0.0)
  }

  test("prunable fraction outside [0,1] is rejected") {
    intercept[IllegalArgumentException](Athena.latencySeconds(1e9, 1.5))
  }
}
