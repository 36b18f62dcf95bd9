package repro.model

import org.scalatest.funsuite.AnyFunSuite

class VmModelSpec extends AnyFunSuite {

  test("three r5.12xlarge meet the 1 TB / 10 s target from DRAM (footnote 3)") {
    assert(VmModel.instancesForTarget(VmModel.R5_12xlarge, 1e12, 10.0) == 3)
  }

  test("seven i3.16xlarge meet the target from NVMe (footnote 3)") {
    assert(VmModel.instancesForTarget(VmModel.I3_16xlarge, 1e12, 10.0) == 7)
  }

  test("thirteen c5n.18xlarge meet the target from S3 (footnote 3)") {
    assert(VmModel.instancesForTarget(VmModel.C5n18xlarge, 1e12, 10.0) == 13)
  }

  test("storage tiers are ordered DRAM > NVMe > S3 by scan bandwidth") {
    assert(VmModel.R5_12xlarge.scanBytesPerSecond > VmModel.I3_16xlarge.scanBytesPerSecond)
    assert(VmModel.I3_16xlarge.scanBytesPerSecond > VmModel.C5n18xlarge.scanBytesPerSecond)
  }

  test("VM start-up is the intro simulation's 2 minutes (footnote 2)") {
    assert(VmModel.VmStartupSeconds == 120.0)
    assert(VmModel.C5nXlarge.startupSeconds == 120.0)
  }

  test("instance sizing is monotone in data volume") {
    val tier = VmModel.C5n18xlarge
    assert(VmModel.instancesForTarget(tier, 2e12, 10.0) >
      VmModel.instancesForTarget(tier, 1e12, 10.0))
  }

  test("halving the latency target doubles the fleet (within rounding)") {
    val tier = VmModel.I3_16xlarge
    val n10 = VmModel.instancesForTarget(tier, 1e12, 10.0)
    val n5  = VmModel.instancesForTarget(tier, 1e12, 5.0)
    assert(n5 >= 2 * n10 - 1)
  }
}
