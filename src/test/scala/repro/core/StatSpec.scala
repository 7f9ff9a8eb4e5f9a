package repro.core

import org.scalatest.funsuite.AnyFunSuite

class StatSpec extends AnyFunSuite {

  test("uniform is deterministic in (seed, index)") {
    assert(Stat.uniform(7, 42) == Stat.uniform(7, 42))
    assert(Stat.uniform(7, 42) != Stat.uniform(8, 42))
    assert(Stat.uniform(7, 42) != Stat.uniform(7, 43))
  }

  test("uniform stays strictly inside (0, 1)") {
    (0L until 10000L).foreach { i =>
      val u = Stat.uniform(3, i)
      assert(u > 0.0 && u < 1.0)
    }
  }

  test("uniform has approximately uniform mean and spread") {
    val n = 100000
    val us = (0L until n.toLong).map(Stat.uniform(11, _))
    val mean = us.sum / n
    assert(math.abs(mean - 0.5) < 0.005, s"mean $mean")
    assert(us.count(_ < 0.1).toDouble / n > 0.08)
    assert(us.count(_ > 0.9).toDouble / n > 0.08)
  }

  test("mix64 avalanche: neighboring indexes decorrelate") {
    val a = Stat.mix64(1, 100)
    val b = Stat.mix64(1, 101)
    assert(java.lang.Long.bitCount(a ^ b) > 10)
  }

  test("normalCdf at known points") {
    assert(math.abs(Stat.normalCdf(0.0) - 0.5) < 1e-7)
    assert(math.abs(Stat.normalCdf(1.959964) - 0.975) < 1e-5)
    assert(math.abs(Stat.normalCdf(-1.959964) - 0.025) < 1e-5)
    assert(math.abs(Stat.normalCdf(2.326348) - 0.99) < 1e-5)
    assert(Stat.normalCdf(8.0) > 0.9999999)
    assert(Stat.normalCdf(-8.0) < 1e-7)
  }

  test("normalCdf is monotone") {
    var prev = Stat.normalCdf(-6.0)
    var x = -6.0 + 0.01
    while (x < 6.0) {
      val c = Stat.normalCdf(x)
      assert(c >= prev - 1e-9, s"not monotone at $x")
      prev = c
      x += 0.01
    }
  }

  test("inverseNormalCdf at known points") {
    assert(math.abs(Stat.inverseNormalCdf(0.5)) < 1e-8)
    assert(math.abs(Stat.inverseNormalCdf(0.975) - 1.959964) < 1e-5)
    assert(math.abs(Stat.inverseNormalCdf(0.999) - 3.090232) < 1e-5)
    assert(math.abs(Stat.inverseNormalCdf(0.001) + 3.090232) < 1e-5)
  }

  test("inverseNormalCdf round-trips through normalCdf across (0,1)") {
    var p = 0.001
    while (p < 0.999) {
      val x = Stat.inverseNormalCdf(p)
      assert(math.abs(Stat.normalCdf(x) - p) < 1e-6, s"at p=$p")
      p += 0.0013
    }
  }

  test("inverseNormalCdf handles extreme tails") {
    assert(Stat.inverseNormalCdf(1e-12) < -6.0)
    assert(Stat.inverseNormalCdf(1.0 - 1e-12) > 6.0)
  }

  test("inverseNormalCdf rejects out-of-range p") {
    intercept[IllegalArgumentException](Stat.inverseNormalCdf(0.0))
    intercept[IllegalArgumentException](Stat.inverseNormalCdf(1.0))
    intercept[IllegalArgumentException](Stat.inverseNormalCdf(-0.5))
  }

  test("rankOf matches the paper's ceil(phi*N) rule") {
    assert(Stat.rankOf(0.5, 100) == 50)
    assert(Stat.rankOf(0.999, 131072) == 130941)
    assert(Stat.rankOf(0.5, 101) == 51)
    assert(Stat.rankOf(1.0, 10) == 10)
    assert(Stat.rankOf(0.0001, 10) == 1)
  }

  test("exactQuantile on a known array") {
    val a = Array(5.0, 1.0, 3.0, 2.0, 4.0)
    assert(Stat.exactQuantile(a, 0.5) == 3.0)
    assert(Stat.exactQuantile(a, 1.0) == 5.0)
    assert(Stat.exactQuantile(a, 0.2) == 1.0)
    assert(Stat.exactQuantile(a, 0.21) == 2.0)
  }

  test("exactQuantile rejects empty input") {
    intercept[IllegalArgumentException](Stat.exactQuantile(Array.emptyDoubleArray, 0.5))
  }
}
