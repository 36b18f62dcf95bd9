package repro.report

import org.scalatest.funsuite.AnyFunSuite

class TablesSpec extends AnyFunSuite {

  test("Table 1 rows reproduce the paper's concurrent rates exactly") {
    Tables.table1Rows.foreach { r =>
      val (pMs, pRate, pIntra) = PaperNumbers.Table1(r.region)
      assert(r.singleMs == pMs)
      assert(r.concurrentRate == pRate)
      assert(r.intraRegionRate == pIntra)
    }
  }

  test("Fig 5 data: last initiation < 3 s, all running < 4 s, driver-only 13-18 s") {
    val d = Tables.fig5Data()
    assert(d.lastInitiated < 3.0)
    assert(d.makespan < 4.0)
    assert(d.driverOnlyIssue > 13.0 && d.driverOnlyIssue < 18.0)
  }

  test("Table 2 rows: formula equals measurement for all six variants at P=64") {
    Tables.table2Rows(64).foreach { r =>
      assert(r.formulaReads == r.measuredGets, r.algo.label)
      assert(r.formulaWrites == r.measuredPuts, r.algo.label)
      assert(r.formulaLists == r.measuredLists, r.algo.label)
    }
  }

  test("Fig 9 rows cover 4 fleet sizes x 6 algorithms") {
    assert(Tables.fig9Rows().size == 24)
  }

  test("Table 3 rows include all published systems") {
    val systems = Tables.table3Rows.map(_.system).toSet
    assert(systems == Set("pocket", "pocket-baseline", "locus", "lambada"))
  }

  test("Fig 10 rows sweep 5 memory sizes x 3 file counts") {
    val rows = Tables.fig10Rows()
    assert(rows.size == 15)
    assert(rows.map(r => (r.memoryMiB, r.filesPerWorker)).distinct.size == 15)
    rows.foreach(r => assert(r.cold.latencySeconds > r.hot.latencySeconds))
  }

  test("Fig 11 data separates a fast and a slow class for both queries") {
    val q1 = Tables.fig11Data(repro.core.Queries.Q1Profile)
    val q6 = Tables.fig11Data(repro.core.Queries.Q6Profile)
    assert(q1.fastClassMedian < 0.5 && q1.slowClassMedian > 2.0)
    assert(q6.fastClassMedian < 0.5 && q6.slowClassMedian > 1.5)
    assert(q6.prunedFraction > q1.prunedFraction)
  }

  test("Fig 12: Athena is ~4x slower than Lambada on Q1 at SF 1k") {
    val rows = Tables.fig12Rows()
    def latency(q: String, sf: Int, sys: String, mode: String) =
      rows.find(r => r.query == q && r.sf == sf && r.system == sys && r.mode == mode).get
        .latencySeconds
    val ratio = latency("Q1", 1000, "athena", "-") / latency("Q1", 1000, "lambada", "hot")
    assert(ratio > 3.0 && ratio < 5.5, s"paper ~4x, ours $ratio")
  }

  test("Fig 12: at SF 10k Lambada leads Athena by ~26x (Q1) and ~15x (Q6)") {
    val rows = Tables.fig12Rows()
    def latency(q: String, sf: Int, sys: String, mode: String) =
      rows.find(r => r.query == q && r.sf == sf && r.system == sys && r.mode == mode).get
        .latencySeconds
    val rQ1 = latency("Q1", 10000, "athena", "-") / latency("Q1", 10000, "lambada", "hot")
    val rQ6 = latency("Q6", 10000, "athena", "-") / latency("Q6", 10000, "lambada", "hot")
    assert(rQ1 > 20 && rQ1 < 40, s"paper ~26x, ours $rQ1")
    assert(rQ6 > 10 && rQ6 < 20, s"paper ~15x, ours $rQ6")
  }

  test("Fig 12: Lambada is ~1 order cheaper than Athena, ~2 than BigQuery (Q1)") {
    val rows = Tables.fig12Rows()
    def usd(q: String, sf: Int, sys: String, mode: String) =
      rows.find(r => r.query == q && r.sf == sf && r.system == sys && r.mode == mode).get.usd
    val athena = usd("Q1", 1000, "athena", "-") / usd("Q1", 1000, "lambada", "hot")
    val bq     = usd("Q1", 1000, "bigquery", "hot") / usd("Q1", 1000, "lambada", "hot")
    assert(athena > 5 && athena < 20, s"~1 order, ours $athena")
    assert(bq > 30 && bq < 200, s"~2 orders, ours $bq")
  }

  test("Fig 12: for Q6 at SF 1k Lambada and Athena cost about the same") {
    val rows = Tables.fig12Rows()
    def usd(sys: String, mode: String) =
      rows.find(r => r.query == "Q6" && r.sf == 1000 && r.system == sys && r.mode == mode).get.usd
    val ratio = usd("athena", "-") / usd("lambada", "hot")
    assert(ratio > 0.7 && ratio < 1.5, s"paper: Lambada slightly cheaper; ours ratio=$ratio")
  }

  test("Fig 12: BigQuery hot beats everyone at SF 1k but pays a huge load delay") {
    val rows = Tables.fig12Rows()
    val bqHot  = rows.find(r => r.query == "Q1" && r.sf == 1000 && r.system == "bigquery" &&
      r.mode == "hot").get
    val bqCold = rows.find(r => r.query == "Q1" && r.sf == 1000 && r.system == "bigquery" &&
      r.mode.startsWith("cold")).get
    val lamHot = rows.find(r => r.query == "Q1" && r.sf == 1000 && r.system == "lambada" &&
      r.mode == "hot").get
    assert(bqHot.latencySeconds < lamHot.latencySeconds)
    assert(bqCold.latencySeconds > 2000, "~40 min load")
  }

  test("Fig 12: at SF 10k BigQuery is slower than Lambada on Q1, faster on Q6") {
    val rows = Tables.fig12Rows()
    def latency(q: String, sys: String) =
      rows.find(r => r.query == q && r.sf == 10000 && r.system == sys &&
        (r.mode == "hot" || r.mode == "-")).get.latencySeconds
    assert(latency("Q1", "bigquery") > latency("Q1", "lambada"))
    assert(latency("Q6", "bigquery") < latency("Q6", "lambada"))
  }

  test("Fig 1a rows: FaaS interactive, IaaS cheaper at its optimum") {
    val rows = Tables.fig1aRows()
    val faas = rows.filter(_.strategy == "faas")
    val iaas = rows.filter(_.strategy == "iaas-job-scoped")
    assert(faas.map(_.latencySeconds).min < 10)
    assert(iaas.map(_.usd).min < faas.map(_.usd).min / 4)
  }

  test("Fig 1b rows: FaaS cheapest at 0.1 q/h, IaaS cheapest at 100 q/h") {
    val rows = Tables.fig1bRows()
    val sporadic = rows.find(_.queriesPerHour == 0.1).get.costs
    val busy     = rows.find(_.queriesPerHour == 100).get.costs
    assert(sporadic("faas") == sporadic.values.min)
    assert(busy.minBy(_._2)._1.startsWith("iaas"))
  }

  test("every render function produces a non-empty table") {
    val renders = Seq(
      Tables.renderTable1, Tables.renderFig4, Tables.renderFig5, Tables.renderFig6,
      Tables.renderFig7, Tables.renderTable2(64), Tables.renderFig9, Tables.renderTable3,
      Tables.renderFig13, Tables.renderFig1a, Tables.renderFig1b,
      Tables.renderFig10(Tables.fig10Rows()),
      Tables.renderFig11(Seq(Tables.fig11Data(repro.core.Queries.Q1Profile))),
      Tables.renderFig12(Tables.fig12Rows()),
    )
    renders.foreach { t =>
      assert(t.startsWith("== "))
      assert(t.linesIterator.size > 3)
    }
  }
}
