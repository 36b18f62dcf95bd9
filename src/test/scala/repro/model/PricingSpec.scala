package repro.model

import org.scalatest.funsuite.AnyFunSuite

class PricingSpec extends AnyFunSuite {

  test("a 2 GiB worker costs the paper's $3.3e-5 per second") {
    assert(math.abs(Pricing.lambdaPerSecond(2048) - 3.3e-5) < 1e-12)
  }

  test("1792 MiB (1 vCPU) worker is cheaper per second than 3008 MiB") {
    assert(Pricing.lambdaPerSecond(1792) < Pricing.lambdaPerSecond(3008))
  }

  test("per-second price is linear in memory") {
    assert(math.abs(Pricing.lambdaPerSecond(2048) - 2 * Pricing.lambdaPerSecond(1024)) < 1e-15)
  }

  test("one million S3 GETs cost $0.40 (Section 4.3.1)") {
    assert(math.abs(Pricing.S3GetPerRequest * 1e6 - 0.4) < 1e-9)
  }

  test("one million S3 PUTs cost $5 (Section 4.4.1)") {
    assert(math.abs(Pricing.S3PutPerRequest * 1e6 - 5.0) < 1e-9)
  }

  test("LIST requests are charged like writes (Section 4.4.3)") {
    assert(Pricing.S3ListPerRequest == Pricing.S3PutPerRequest)
  }

  test("writes are 12.5x more expensive than reads") {
    assert(math.abs(Pricing.S3PutPerRequest / Pricing.S3GetPerRequest - 12.5) < 1e-9)
  }

  test("QaaS price is $5 per TiB for both systems (Section 5.4.1)") {
    assert(Pricing.QaaSPerTiB == 5.0)
  }

  test("a million Lambda invocations cost $0.20") {
    assert(math.abs(Pricing.LambdaPerInvocation * 1e6 - 0.20) < 1e-9)
  }

  test("byte unit constants are consistent") {
    assert(Pricing.MiB == 1024 * 1024.0)
    assert(Pricing.GiB == 1024 * Pricing.MiB)
    assert(Pricing.TiB == 1024 * Pricing.GiB)
    assert(Pricing.TB == 1e12)
  }

  test("EC2 hourly prices are positive and ordered by instance size") {
    import Pricing.Ec2HourlyUsd._
    assert(C5nXlarge > 0 && C5nXlarge < R5_12xlarge)
    assert(R5_12xlarge < C5n18xlarge && C5n18xlarge < I3_16xlarge)
  }
}
