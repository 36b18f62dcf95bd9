package repro.model

/** AWS price book as of the paper's writing (us-east-1, 2019).
  *
  * Every dollar figure produced anywhere in this reproduction comes from the
  * constants below, so a reader can audit a reproduced table against the
  * paper's quoted rates (Sections 4.3.1, 4.4.1, 5.4.1) in one place.
  */
object Pricing {

  /** Dollars per GiB-second of AWS Lambda execution.
    *
    * The paper quotes $3.3e-5 per second for a 2 GiB worker (Section 4.4.4),
    * i.e. $1.65e-5 per GiB-second.
    */
  val LambdaPerGiBSecond: Double = 1.65e-5

  /** Dollars per single Lambda invocation ($0.20 per million). */
  val LambdaPerInvocation: Double = 0.20 / 1e6

  /** Dollars per S3 GET request ($0.40 per million, Section 4.3.1). */
  val S3GetPerRequest: Double = 0.40 / 1e6

  /** Dollars per S3 PUT request ($5 per million, Section 4.4.1). */
  val S3PutPerRequest: Double = 5.0 / 1e6

  /** Dollars per S3 LIST request (charged like PUT, Section 4.4.3). */
  val S3ListPerRequest: Double = 5.0 / 1e6

  /** QaaS price per TiB of input scanned — identical for Amazon Athena and
    * Google BigQuery (Section 5.4.1: "1 TiB of input costs \$5 in both").
    */
  val QaaSPerTiB: Double = 5.0

  /** Dollars per second for a worker with the given Lambda memory size. */
  def lambdaPerSecond(memoryMiB: Int): Double =
    memoryMiB / 1024.0 * LambdaPerGiBSecond

  /** On-demand EC2 hourly prices (us-east-1, 2019) for the instance types the
    * paper's simulations use (footnotes 1 and 3).
    */
  object Ec2HourlyUsd {
    val C5nXlarge: Double   = 0.216  // job-scoped scan workers (Fig 1a)
    val R5_12xlarge: Double = 3.024  // always-on, data in DRAM (Fig 1b)
    val I3_16xlarge: Double = 4.992  // always-on, data on NVMe (Fig 1b)
    val C5n18xlarge: Double = 3.888  // always-on, scanning from S3 (Fig 1b)
  }

  /** Bytes helpers used across the models. */
  val KiB: Double = 1024.0
  val MiB: Double = 1024.0 * 1024.0
  val GiB: Double = 1024.0 * MiB
  val TiB: Double = 1024.0 * GiB
  /** Decimal units — dataset sizes in the paper ("100 GB", "1 TB") are decimal. */
  val GB: Double = 1e9
  val TB: Double = 1e12
}
