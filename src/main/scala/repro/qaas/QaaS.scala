package repro.qaas

import repro.model.Pricing

/** Cost and latency models of the Query-as-a-Service baselines of Section
  * 5.4. Pricing is exactly the published model ($5/TiB of input, with
  * Athena counting only selected rows and BigQuery counting whole columns);
  * runtime throughput constants are calibrated to the paper's reported
  * endpoints and documented here.
  */
object Athena {

  /** Effective cluster scan throughput over Parquet on S3. Calibrated so Q1
    * at SF 1000 lands ~4x slower than Lambada's fast configurations.
    */
  val ThroughputBytesPerSecond: Double = 3.6 * Pricing.GiB

  /** Fixed per-query overhead (planning, scheduling, result fetch). */
  val OverheadSeconds: Double = 3.0

  /** Fraction of min/max-prunable row groups Athena's reader actually skips
    * (its Parquet pushdown is real but less tight than a per-file driver
    * prune).
    */
  val PushdownEfficiency: Double = 0.6

  /** Latency: Athena dedicates a fixed resource pool, so runtime grows
    * linearly with the bytes it reads (Section 5.4.2: "running time
    * increases linearly").
    */
  def latencySeconds(usedColumnBytes: Double, prunableFileFraction: Double): Double = {
    require(prunableFileFraction >= 0 && prunableFileFraction <= 1)
    val read = usedColumnBytes * (1.0 - prunableFileFraction * PushdownEfficiency)
    OverheadSeconds + read / ThroughputBytesPerSecond
  }

  /** Dollars: $5/TiB over the used columns of the *selected rows* —
    * "selections are pushed into the cost model" (Section 5.4.1).
    */
  def dollars(usedColumnBytes: Double, rowSelectivity: Double): Double =
    usedColumnBytes * rowSelectivity / Pricing.TiB * Pricing.QaaSPerTiB
}

object BigQuery {

  /** Size expansion of BigQuery's proprietary format over our gzip Parquet:
    * the paper's LINEITEM takes 823 GiB loaded vs 151 GiB Parquet.
    */
  val FormatExpansion: Double = 823.0 / 151.0

  /** ETL load throughput — reproduces the reported 40 min (SF 1k) and 6.7 h
    * (SF 10k) load times, which the paper found to scale linearly.
    */
  val LoadBytesPerSecond: Double = 0.342 * Pricing.GiB

  /** Hot-query runtime calibration per query: seconds at SF 1000 and the
    * empirical sublinear scaling exponent (BigQuery adds resources with
    * dataset size; Section 5.4.2 reports Q1 3.9 s → ~2.3x slower than
    * Lambada at SF 10k, Q6 1.6 s → ~2x faster).
    */
  final case class QueryCalibration(hotSecondsSf1000: Double, scalingExponent: Double)
  val Q1: QueryCalibration = QueryCalibration(3.9, 0.55)
  val Q6: QueryCalibration = QueryCalibration(1.6, 0.23)

  /** Hot (post-load) query latency at `sf` scale factor. */
  def hotSeconds(cal: QueryCalibration, sf: Double): Double = {
    require(sf > 0)
    cal.hotSecondsSf1000 * math.pow(sf / 1000.0, cal.scalingExponent)
  }

  /** Load time of a dataset whose Parquet footprint is `parquetBytes`. */
  def loadSeconds(parquetBytes: Double): Double =
    parquetBytes * FormatExpansion / LoadBytesPerSecond

  /** Cold latency = ETL load + first query (Section 5.4.1's "cold"). */
  def coldSeconds(cal: QueryCalibration, sf: Double, parquetBytes: Double): Double =
    loadSeconds(parquetBytes) + hotSeconds(cal, sf)

  /** Dollars: all used columns are charged in their entirety, in the
    * expanded storage format; selections do not reduce the bill.
    */
  def dollars(parquetUsedColumnBytes: Double): Double =
    parquetUsedColumnBytes * FormatExpansion / Pricing.TiB * Pricing.QaaSPerTiB
}
