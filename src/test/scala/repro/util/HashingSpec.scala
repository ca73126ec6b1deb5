package repro.util

import org.scalatest.funsuite.AnyFunSuite
import repro.util.Hashing._

class HashingSpec extends AnyFunSuite {

  test("tabulation hash is deterministic in the seed") {
    val a = new Tabulation64(11)
    val b = new Tabulation64(11)
    val c = new Tabulation64(12)
    for (k <- Seq(0, 1, -1, 42, Int.MaxValue, Int.MinValue, 0xdeadbeef)) {
      assert(a.hash(k) == b.hash(k))
    }
    assert(Seq(0, 1, 42, 77).exists(k => a.hash(k) != c.hash(k)))
  }

  test("tabulation hash has no trivial collisions among distinct small keys") {
    val t = new Tabulation64(5)
    val hashes = (0 until 100000).map(t.hash)
    assert(hashes.distinct.size == hashes.size)
  }

  test("tabulation hash bits are roughly balanced") {
    val t = new Tabulation64(9)
    val n = 20000
    var ones = 0L
    for (k <- 0 until n) ones += java.lang.Long.bitCount(t.hash(k))
    val mean = ones.toDouble / n
    assert(math.abs(mean - 32.0) < 0.5, s"mean popcount $mean too far from 32")
  }

  test("mix64 is injective on a sample (bijection sanity)") {
    val xs = (0L until 50000L).map(mix64)
    assert(xs.distinct.size == xs.size)
  }

  test("mix64 changes roughly half the bits under single-bit input flips") {
    var totalFlips = 0L
    val trials = 2000
    for (i <- 0 until trials) {
      val x = mix64(i.toLong * 0x9e3779b97f4a7c15L)
      val bit = i % 64
      totalFlips += java.lang.Long.bitCount(mix64(x) ^ mix64(x ^ (1L << bit)))
    }
    val avg = totalFlips.toDouble / trials
    assert(math.abs(avg - 32.0) < 2.0, s"avalanche average $avg")
  }

  test("toUnitDouble lies in [0,1) and is roughly uniform") {
    val n = 100000
    var sum = 0.0
    var inFirstHalf = 0
    for (i <- 0 until n) {
      val u = toUnitDouble(mix64(i.toLong))
      assert(u >= 0.0 && u < 1.0)
      sum += u
      if (u < 0.5) inFirstHalf += 1
    }
    assert(math.abs(sum / n - 0.5) < 0.01)
    assert(math.abs(inFirstHalf.toDouble / n - 0.5) < 0.01)
  }

  test("combine differs when either argument changes") {
    assert(combine(1, 2) != combine(1, 3))
    assert(combine(1, 2) != combine(2, 2))
    assert(combine(0, 0) != combine(0, 1))
  }

  test("inverseNormalCdf matches known quantiles") {
    val cases = Seq(
      0.5 -> 0.0, 0.975 -> 1.959964, 0.95 -> 1.644854,
      0.9 -> 1.281552, 0.05 -> -1.644854, 0.025 -> -1.959964,
      0.8413447 -> 1.0, 0.9986501 -> 3.0,
    )
    for ((p, z) <- cases)
      assert(math.abs(inverseNormalCdf(p) - z) < 1e-4, s"Phi^-1($p) != $z")
  }

  test("inverseNormalCdf is monotone") {
    val ps = (1 to 99).map(_ / 100.0)
    val zs = ps.map(inverseNormalCdf)
    assert(zs == zs.sorted)
  }

  test("inverseNormalCdf rejects p outside (0,1)") {
    intercept[IllegalArgumentException](inverseNormalCdf(0.0))
    intercept[IllegalArgumentException](inverseNormalCdf(1.0))
    intercept[IllegalArgumentException](inverseNormalCdf(-0.1))
  }
}
