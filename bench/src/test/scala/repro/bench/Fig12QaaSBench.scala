package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.report.Tables

/** Fig 12 — Lambada vs Amazon Athena vs Google BigQuery on Q1/Q6 at SF 1000
  * and SF 10000: end-to-end latency and dollars.
  */
class Fig12QaaSBench extends AnyFunSuite {

  private lazy val rows = Tables.fig12Rows()

  private def latency(q: String, sf: Int, sys: String, mode: String = "hot"): Double =
    rows.find(r => r.query == q && r.sf == sf && r.system == sys &&
      (r.mode == mode || (sys == "athena" && r.mode == "-"))).get.latencySeconds

  private def usd(q: String, sf: Int, sys: String, mode: String = "hot"): Double =
    rows.find(r => r.query == q && r.sf == sf && r.system == sys &&
      (r.mode == mode || (sys == "athena" && r.mode == "-"))).get.usd

  test("Fig 12: print the reproduced table") {
    println(Tables.renderFig12(rows))
  }

  test("claim: Lambada's latency stays roughly constant across scale factors") {
    assert(latency("Q1", 10000, "lambada") < 1.6 * latency("Q1", 1000, "lambada"))
  }

  test("claim: Athena's latency grows ~linearly with the scale factor") {
    val ratio = (latency("Q1", 10000, "athena") - 3.0) / (latency("Q1", 1000, "athena") - 3.0)
    assert(ratio > 8 && ratio < 12, s"~10x expected, got $ratio")
  }

  test("claim: Lambada ~4x faster than Athena on Q1 at SF 1k, 26x/15x at SF 10k") {
    val r1k  = latency("Q1", 1000, "athena") / latency("Q1", 1000, "lambada")
    val r10k = latency("Q1", 10000, "athena") / latency("Q1", 10000, "lambada")
    val r6   = latency("Q6", 10000, "athena") / latency("Q6", 10000, "lambada")
    println(f"Athena/Lambada: Q1@1k $r1k%.1fx (paper ~4), Q1@10k $r10k%.1fx (paper ~26), " +
      f"Q6@10k $r6%.1fx (paper ~15)")
    assert(r1k > 3 && r1k < 6)
    assert(r10k > 20 && r10k < 40)
    assert(r6 > 10 && r6 < 20)
  }

  test("claim: BigQuery is fastest hot at SF 1k but pays a 40 min / 6.7 h load") {
    assert(latency("Q1", 1000, "bigquery") < latency("Q1", 1000, "lambada"))
    val load1k  = latency("Q1", 1000, "bigquery", "cold(load+query)")
    val load10k = latency("Q1", 10000, "bigquery", "cold(load+query)")
    assert(load1k > 35 * 60 && load1k < 45 * 60)
    assert(load10k > 6.0 * 3600 && load10k < 7.4 * 3600)
  }

  test("claim: at SF 10k BigQuery falls behind Lambada on Q1, stays ahead on Q6") {
    assert(latency("Q1", 10000, "bigquery") > 1.8 * latency("Q1", 10000, "lambada"))
    assert(latency("Q6", 10000, "bigquery") < latency("Q6", 10000, "lambada") / 1.5)
  }

  test("claim: Lambada is cheaper than both systems for every query and scale") {
    for (q <- Seq("Q1", "Q6"); sf <- Seq(1000, 10000)) {
      val lam = usd(q, sf, "lambada")
      assert(lam <= usd(q, sf, "athena") * 1.05, s"$q SF$sf vs athena")
      assert(lam < usd(q, sf, "bigquery"), s"$q SF$sf vs bigquery")
    }
  }

  test("claim: ~1 order of magnitude cheaper than Athena, ~2 than BigQuery (Q1)") {
    val a = usd("Q1", 1000, "athena") / usd("Q1", 1000, "lambada")
    val b = usd("Q1", 1000, "bigquery") / usd("Q1", 1000, "lambada")
    println(f"cost gap: Athena ${a}%.0fx (paper ~10x), BigQuery ${b}%.0fx (paper ~100x)")
    assert(a > 5 && a < 20)
    assert(b > 30)
  }

  test("claim: selections reach Athena's cost model — Q6 is nearly free there too") {
    assert(usd("Q6", 1000, "athena") < usd("Q1", 1000, "athena") / 20)
  }
}
