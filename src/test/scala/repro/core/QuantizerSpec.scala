package repro.core

import org.scalatest.funsuite.AnyFunSuite

class QuantizerSpec extends AnyFunSuite {

  test("keeps three significant digits") {
    assert(Quantizer.quantize(123456.0) == 123000.0)
    assert(Quantizer.quantize(1874.0) == 1870.0)
    assert(Quantizer.quantize(798.0) == 798.0)
    assert(Quantizer.quantize(74265.0) == 74300.0)
    assert(math.abs(Quantizer.quantize(0.0012345) - 0.00123) < 1e-12)
  }

  test("rounds to nearest, not truncates") {
    assert(Quantizer.quantize(1876.0) == 1880.0)
    assert(Quantizer.quantize(1999.5) == 2000.0)
  }

  test("zero and non-finite pass through") {
    assert(Quantizer.quantize(0.0) == 0.0)
    assert(Quantizer.quantize(Double.PositiveInfinity).isPosInfinity)
    assert(Quantizer.quantize(Double.NaN).isNaN)
  }

  test("negative values keep sign and magnitude quantization") {
    assert(Quantizer.quantize(-123456.0) == -123000.0)
    assert(Quantizer.quantize(-798.4) == -798.0)
  }

  test("digits parameter controls precision") {
    assert(Quantizer.quantize(123456.0, 1) == 100000.0)
    assert(Quantizer.quantize(123456.0, 2) == 120000.0)
    assert(Quantizer.quantize(123456.0, 6) == 123456.0)
  }

  test("rejects non-positive digits") {
    intercept[IllegalArgumentException](Quantizer.quantize(1.0, 0))
  }

  test("relative error is below 0.5% for three digits (property)") {
    val rnd = new scala.util.Random(1)
    (1 to 5000).foreach { _ =>
      val v = math.pow(10.0, rnd.nextDouble() * 12 - 6) * (1 + rnd.nextDouble())
      val q = Quantizer.quantize(v)
      assert(math.abs(q - v) / v <= 0.005 + 1e-12, s"v=$v q=$q")
    }
  }

  test("quantization is idempotent (property)") {
    val rnd = new scala.util.Random(2)
    (1 to 2000).foreach { _ =>
      val v = rnd.nextDouble() * 1e6
      val q = Quantizer.quantize(v)
      assert(Quantizer.quantize(q) == q, s"v=$v")
    }
  }

  test("quantization is monotone non-decreasing (property)") {
    val rnd = new scala.util.Random(3)
    (1 to 2000).foreach { _ =>
      val a = rnd.nextDouble() * 1e5
      val b = a + rnd.nextDouble() * 1e3
      assert(Quantizer.quantize(a) <= Quantizer.quantize(b), s"a=$a b=$b")
    }
  }

  test("integer microsecond latencies collapse to few uniques") {
    // 10000 values in [1000, 2000) -> at most 101 distinct 3-digit values
    val rnd = new scala.util.Random(4)
    val qs = (1 to 10000).map(_ => Quantizer.quantize(1000 + rnd.nextDouble() * 1000)).toSet
    assert(qs.size <= 101, s"got ${qs.size} uniques")
  }
}
