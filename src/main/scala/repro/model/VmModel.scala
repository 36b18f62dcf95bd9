package repro.model

/** EC2 instance catalogue for the paper's IaaS simulations (Fig 1).
  *
  * Scan bandwidths for the always-on tiers are inverted from the paper's own
  * sizing statement: "three large instances if we load and read the data from
  * fast DRAM, seven of the largest instances if using somewhat slower NVMe,
  * and thirteen instances if we process the data directly from S3" for a
  * 1 TB / 10 s target (Section 1, footnote 3).
  */
final case class InstanceType(
    name: String,
    hourlyUsd: Double,
    scanBytesPerSecond: Double,
    startupSeconds: Double,
)

object VmModel {
  /** VM start-up assumption of the intro simulation (footnote 2). */
  val VmStartupSeconds: Double = 120.0

  /** Job-scoped scan worker of Fig 1a: network-optimized instance scanning
    * from S3 at ~1.15 GB/s (c5n.xlarge has 25 Gbit/s burst networking).
    */
  val C5nXlarge: InstanceType =
    InstanceType("c5n.xlarge", Pricing.Ec2HourlyUsd.C5nXlarge, 1.15e9, VmStartupSeconds)

  /** Always-on tier: data pre-loaded into DRAM (1 TB / 10 s / 3 instances). */
  val R5_12xlarge: InstanceType =
    InstanceType("r5.12xlarge", Pricing.Ec2HourlyUsd.R5_12xlarge, 1e12 / 10.0 / 3, VmStartupSeconds)

  /** Always-on tier: data pre-loaded onto NVMe (1 TB / 10 s / 7 instances). */
  val I3_16xlarge: InstanceType =
    InstanceType("i3.16xlarge", Pricing.Ec2HourlyUsd.I3_16xlarge, 1e12 / 10.0 / 7, VmStartupSeconds)

  /** Always-on tier: scanning straight from S3 (1 TB / 10 s / 13 instances). */
  val C5n18xlarge: InstanceType =
    InstanceType("c5n.18xlarge", Pricing.Ec2HourlyUsd.C5n18xlarge, 1e12 / 10.0 / 13, VmStartupSeconds)

  /** Instances needed for `bytes` within `targetSeconds` on `tier`. */
  def instancesForTarget(tier: InstanceType, bytes: Double, targetSeconds: Double): Int =
    math.ceil(bytes / (tier.scanBytesPerSecond * targetSeconds)).toInt
}
