package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.Stat

class GKSpec extends AnyFunSuite {

  private def exactRank(sorted: Array[Double], v: Double): (Long, Long) = {
    val below = sorted.count(_ < v).toLong
    val at = sorted.count(_ == v).toLong
    (below + 1, below + math.max(at, 1))
  }

  test("rejects invalid epsilon") {
    intercept[IllegalArgumentException](new GKSketch(0.0))
    intercept[IllegalArgumentException](new GKSketch(1.0))
  }

  test("query respects the epsilon rank bound (property over distributions)") {
    val rnd = new scala.util.Random(41)
    for ((name, gen) <- Seq[(String, () => Double)](
      ("uniform", () => rnd.nextDouble() * 1000),
      ("duplicates", () => rnd.nextInt(20).toDouble),
      ("heavy-tail", () => math.pow(rnd.nextDouble(), -1.2)))) {
      val eps = 0.02
      val sk = new GKSketch(eps)
      val data = Array.fill(5000)(gen())
      data.foreach(sk.insert)
      val sorted = data.sorted
      for (phi <- Seq(0.01, 0.1, 0.5, 0.9, 0.99, 0.999)) {
        val r = Stat.rankOf(phi, data.length)
        val v = sk.query(r)
        val (lo, hi) = exactRank(sorted, v)
        val dist = if (r >= lo && r <= hi) 0L else math.min(math.abs(r - lo), math.abs(r - hi))
        assert(dist <= math.ceil(eps * data.length).toLong,
          s"$name phi=$phi rank err $dist > ${eps * data.length}")
      }
    }
  }

  test("summary is much smaller than the data") {
    val rnd = new scala.util.Random(42)
    val sk = new GKSketch(0.01)
    (1 to 20000).foreach(_ => sk.insert(rnd.nextDouble()))
    assert(sk.tupleCount < 2000, s"tuples ${sk.tupleCount}")
    assert(sk.observedSpace == 3L * sk.tupleCount)
  }

  test("keeps exact min and max") {
    val rnd = new scala.util.Random(43)
    val sk = new GKSketch(0.05)
    val data = Array.fill(3000)(rnd.nextDouble() * 500)
    data.foreach(sk.insert)
    assert(sk.query(1) == data.min)
    assert(sk.query(data.length) == data.max)
  }

  test("rankBounds bracket the true rank (property)") {
    val rnd = new scala.util.Random(44)
    val sk = new GKSketch(0.02)
    val data = Array.fill(4000)(rnd.nextInt(300).toDouble)
    data.foreach(sk.insert)
    val sorted = data.sorted
    for (v <- Seq(0.0, 50.0, 150.0, 299.0, 500.0)) {
      val (lo, hi) = sk.rankBounds(v)
      val trueCount = data.count(_ <= v).toLong
      assert(lo <= trueCount, s"v=$v lo=$lo true=$trueCount")
      assert(hi >= trueCount || hi == data.length, s"v=$v hi=$hi true=$trueCount")
    }
  }

  test("empty sketch behaviour") {
    val sk = new GKSketch(0.1)
    assert(sk.count == 0)
    assert(sk.rankBounds(5.0) == (0L, 0L))
    intercept[IllegalArgumentException](sk.query(1))
  }

  test("sorted and reverse-sorted inserts stay within bound") {
    for (reverse <- Seq(false, true)) {
      val eps = 0.05
      val sk = new GKSketch(eps)
      val base = (1 to 3000).map(_.toDouble)
      (if (reverse) base.reverse else base).foreach(sk.insert)
      val r = Stat.rankOf(0.5, 3000)
      val v = sk.query(r)
      assert(math.abs(v - 1500.0) <= eps * 3000 + 1, s"reverse=$reverse got $v")
    }
  }

  test("GKMerge over disjoint chunks respects the combined bound") {
    val rnd = new scala.util.Random(45)
    val eps = 0.02
    val data = Array.fill(8000)(rnd.nextDouble() * 10000)
    val sketches = data.grouped(2000).map { chunk =>
      val sk = new GKSketch(eps / 2)
      chunk.foreach(sk.insert)
      sk
    }.toSeq
    val sorted = data.sorted
    for (phi <- Seq(0.1, 0.5, 0.9, 0.99)) {
      val r = Stat.rankOf(phi, data.length)
      val v = GKMerge.query(sketches, r)
      val (lo, hi) = exactRank(sorted, v)
      val dist = if (r >= lo && r <= hi) 0L else math.min(math.abs(r - lo), math.abs(r - hi))
      assert(dist <= math.ceil(eps * data.length).toLong, s"phi=$phi dist=$dist")
    }
  }

  test("GKMerge.queryMany answers all ranks consistently with query") {
    val rnd = new scala.util.Random(46)
    val sketches = Seq.fill(3) {
      val sk = new GKSketch(0.02)
      (1 to 1000).foreach(_ => sk.insert(rnd.nextDouble() * 100))
      sk
    }
    val ranks = Array(1L, 500L, 1500L, 2999L)
    val many = GKMerge.queryMany(sketches, ranks)
    ranks.zipWithIndex.foreach { case (r, i) =>
      assert(many(i) == GKMerge.query(sketches, r))
    }
  }

  test("GKMerge rejects empty input") {
    intercept[IllegalArgumentException](GKMerge.query(Seq(new GKSketch(0.1)), 1))
  }
}
