package repro.util

import org.scalatest.funsuite.AnyFunSuite

class RngSpec extends AnyFunSuite {

  test("splitmix64 is deterministic") {
    assert(Rng.splitmix64(42L) == Rng.splitmix64(42L))
    assert(Rng.splitmix64(0L) != Rng.splitmix64(1L))
  }

  test("splitmix64 of sequential inputs looks decorrelated") {
    val xs = (0L until 1000L).map(Rng.splitmix64)
    assert(xs.distinct.size == 1000)
  }

  test("toUnitDouble lands in [0,1)") {
    for (i <- 0L until 10000L) {
      val d = Rng.toUnitDouble(Rng.splitmix64(i))
      assert(d >= 0.0 && d < 1.0)
    }
  }

  test("toUnitDouble mean is about one half") {
    val n = 100000
    val mean = (0L until n.toLong).map(i => Rng.toUnitDouble(Rng.splitmix64(i))).sum / n
    assert(math.abs(mean - 0.5) < 0.01, s"mean=$mean")
  }

  test("sampleSeed differs per sample id") {
    val seeds = (0L until 1000L).map(Rng.sampleSeed(99L, _))
    assert(seeds.distinct.size == 1000)
  }

  test("edgeKeep always keeps probability-1 edges") {
    for (s <- 0L until 100L; e <- 0 until 20)
      assert(Rng.edgeKeep(s, e, 1.0))
  }

  test("edgeKeep never keeps probability-0 edges") {
    for (s <- 0L until 100L; e <- 0 until 20)
      assert(!Rng.edgeKeep(s, e, 0.0))
  }

  test("edgeKeep frequency matches the edge probability") {
    for (p <- Seq(0.1, 0.5, 0.9)) {
      val n = 20000
      val hits = (0L until n.toLong).count(s => Rng.edgeKeep(Rng.sampleSeed(7L, s), 3, p))
      val freq = hits.toDouble / n
      assert(math.abs(freq - p) < 0.015, s"p=$p freq=$freq")
    }
  }

  test("edgeKeep is a pure function of (sampleSeed, edge, p)") {
    val a = (0 until 50).map(e => Rng.edgeKeep(123L, e, 0.3))
    val b = (0 until 50).map(e => Rng.edgeKeep(123L, e, 0.3))
    assert(a == b)
  }

  test("edge decisions are independent across edges within a sample") {
    // correlation of keep-decisions of two edges over many samples ≈ p^2
    val n = 20000
    var both = 0
    for (s <- 0L until n.toLong) {
      val seed = Rng.sampleSeed(5L, s)
      if (Rng.edgeKeep(seed, 0, 0.5) && Rng.edgeKeep(seed, 1, 0.5)) both += 1
    }
    val freq = both.toDouble / n
    assert(math.abs(freq - 0.25) < 0.02, s"joint=$freq")
  }

  test("edgeUniform differs across edges for the same sample") {
    val us = (0 until 1000).map(Rng.edgeUniform(42L, _))
    assert(us.distinct.size == 1000)
  }
}
