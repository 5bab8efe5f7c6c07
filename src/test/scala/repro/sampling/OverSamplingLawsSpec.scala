package repro.sampling

import org.scalacheck.{Gen, Prop, Test => SCTest}
import org.scalatest.funsuite.AnyFunSuite

/** ScalaCheck laws for the binomial over-sampling math (§5.3). */
class OverSamplingLawsSpec extends AnyFunSuite {

  private def check(prop: Prop, name: String): Unit = {
    val res = SCTest.check(SCTest.Parameters.default.withMinSuccessfulTests(100), prop)
    assert(res.passed, s"$name: $res")
  }

  private val pGen = Gen.choose(0.05, 0.99)

  test("tail is a probability") {
    check(Prop.forAll(Gen.choose(1L, 500L), Gen.choose(1L, 100L), pGen) { (n, k, p) =>
      val t = OverSampling.tailAtLeast(n, k, p)
      t >= 0.0 && t <= 1.0
    }, "range")
  }

  test("tail is monotone increasing in nOS") {
    check(Prop.forAll(Gen.choose(10L, 300L), Gen.choose(1L, 10L), pGen) { (n, k, p) =>
      OverSampling.tailAtLeast(n + 1, k, p) >= OverSampling.tailAtLeast(n, k, p) - 1e-12
    }, "monotone-n")
  }

  test("tail is monotone decreasing in nS") {
    check(Prop.forAll(Gen.choose(10L, 300L), Gen.choose(1L, 9L), pGen) { (n, k, p) =>
      OverSampling.tailAtLeast(n, k + 1, p) <= OverSampling.tailAtLeast(n, k, p) + 1e-12
    }, "monotone-k")
  }

  test("tail is monotone increasing in p") {
    check(Prop.forAll(Gen.choose(10L, 300L), Gen.choose(1L, 10L), pGen) { (n, k, p) =>
      val p2 = math.min(0.999, p + 0.05)
      OverSampling.tailAtLeast(n, k, p2) >= OverSampling.tailAtLeast(n, k, p) - 1e-12
    }, "monotone-p")
  }

  test("tail complements the binomial CDF: P(X>=1) = 1-(1-p)^n") {
    check(Prop.forAll(Gen.choose(1L, 200L), pGen) { (n, p) =>
      val got = OverSampling.tailAtLeast(n, 1L, p)
      val exp = 1.0 - math.pow(1.0 - p, n.toDouble)
      math.abs(got - exp) < 1e-9
    }, "k=1 closed form")
  }

  test("minOverSample result always meets the guarantee (within cap)") {
    check(Prop.forAll(Gen.choose(1L, 200L), pGen, Gen.choose(0.9, 0.999)) { (nS, p, ps) =>
      val nOS = OverSampling.minOverSample(nS, p, ps, cap = 5_000_000L)
      nOS == 5_000_000L || OverSampling.tailAtLeast(nOS, nS, p) >= ps
    }, "guarantee")
  }

  test("minOverSample is at least nS and decreasing in p") {
    check(Prop.forAll(Gen.choose(1L, 100L), pGen) { (nS, p) =>
      val a = OverSampling.minOverSample(nS, p, 0.99)
      val b = OverSampling.minOverSample(nS, math.min(0.999, p + 0.1), 0.99)
      a >= nS && b <= a
    }, "monotone")
  }

  test("logChoose symmetry and Pascal recurrence") {
    check(Prop.forAll(Gen.choose(2L, 60L), Gen.choose(1L, 30L)) { (n0, k0) =>
      val n = math.max(n0, k0 + 1); val k = math.min(n0, k0)
      val sym = math.abs(OverSampling.logChoose(n, k) - OverSampling.logChoose(n, n - k)) < 1e-9
      val pascal = math.abs(
        math.exp(OverSampling.logChoose(n, k)) -
          (math.exp(OverSampling.logChoose(n - 1, k - 1)) +
            math.exp(OverSampling.logChoose(n - 1, math.min(k, n - 1))))) <
        1e-6 * math.exp(OverSampling.logChoose(n, k)) + 1e-6
      sym && pascal
    }, "choose-laws")
  }
}
