package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.data.Datasets

class CPSJoinLocalSpec extends AnyFunSuite {

  private val p = CPSParams(t = 64, ell = 4, limit = 40, eps = 0.1, delta = 0.05, reps = 10, seed = 99)

  test("selfJoin on empty and single-record inputs") {
    assert(CPSJoinLocal.selfJoinRaw(IndexedSeq.empty, 0.5, p).isEmpty)
    assert(CPSJoinLocal.selfJoinRaw(IndexedSeq(SetRec(0, Array(1, 2))), 0.5, p).isEmpty)
  }

  test("two identical records are always found") {
    val recs = IndexedSeq(SetRec(0, Array(1, 2, 3)), SetRec(1, Array(1, 2, 3)))
    val res = CPSJoinLocal.selfJoinRaw(recs, 0.9, p)
    assert(res.contains((0L, 1L)) && res((0L, 1L)) == 1.0)
  }

  test("deterministic: same seed gives the same result set") {
    val recs = TestUtil.randomRecords(200, 15, 120, seed = 21, spread = 5)
    val a = CPSJoinLocal.selfJoinRaw(recs, 0.5, p)
    val b = CPSJoinLocal.selfJoinRaw(recs, 0.5, p)
    assert(a == b)
  }

  test("repetitions accumulate: reps=1 results are a subset of reps=10") {
    val recs = TestUtil.randomRecords(300, 15, 100, seed = 22, spread = 5)
    val one = CPSJoinLocal.selfJoinRaw(recs, 0.5, p.copy(reps = 1))
    val ten = CPSJoinLocal.selfJoinRaw(recs, 0.5, p.copy(reps = 10))
    assert(one.keySet.subsetOf(ten.keySet))
  }

  test("limit >= n reduces to brute force: all clearly-similar pairs found") {
    val recs = TestUtil.randomRecords(150, 12, 60, seed = 23, spread = 3)
    val res = CPSJoinLocal.selfJoinRaw(recs, 0.5, p.copy(limit = 1000, reps = 1))
    val strong = TestUtil.bruteTruth(recs, 0.65).keySet // well above λ̂ margin
    assert(strong.subsetOf(res.keySet), s"missing ${strong.diff(res.keySet)}")
    TestUtil.assertPerfectPrecision(res, recs, 0.5)
  }

  test("maxDepth = 0 forces exact finish at the root") {
    val recs = TestUtil.randomRecords(120, 12, 60, seed = 24)
    val res = CPSJoinLocal.selfJoinRaw(recs, 0.5, p.copy(maxDepth = 0, reps = 1))
    val strong = TestUtil.bruteTruth(recs, 0.65).keySet
    assert(strong.subsetOf(res.keySet))
  }

  test("splitCoordinates is deterministic and samples ~1/λ coordinates") {
    val c1 = CPSJoinLocal.splitCoordinates(12345L, 128, 0.5)
    val c2 = CPSJoinLocal.splitCoordinates(12345L, 128, 0.5)
    assert(c1.sameElements(c2))
    val counts = (0 until 2000).map(s => CPSJoinLocal.splitCoordinates(s.toLong * 77, 128, 0.5).length)
    val avg = counts.sum.toDouble / counts.length
    assert(math.abs(avg - 2.0) < 0.2, s"expected ~1/λ = 2 coordinates, got $avg")
  }

  test("splitCoordinates samples more coordinates at lower thresholds") {
    def avgFor(lambda: Double) =
      (0 until 2000).map(s => CPSJoinLocal.splitCoordinates(s.toLong * 31, 128, lambda).length)
        .sum.toDouble / 2000
    assert(avgFor(0.5) > avgFor(0.9))
  }

  test("childSeed separates children by coordinate and value") {
    val seeds = for (c <- 0 until 10; v <- 0 until 10) yield CPSJoinLocal.childSeed(7L, c, v)
    assert(seeds.distinct.size == seeds.size)
  }

  test("Observation 2: exact-average rule removes a point similar to its bucket") {
    // Bucket: 60 near-clones (pairwise J high) + 1 far point.
    val base = (0 until 30).toArray
    val clones = (0 until 60).map(i => SetRec(i.toLong, (base :+ (100 + i)).sorted))
    val far = SetRec(999, (1000 until 1030).toArray)
    val hasher = new MinHasher(64, 4, seed = 3)
    val bucket = EmbeddedRec.embedAll((clones :+ far).toIndexedSeq, hasher).toIndexedSeq
    val pp = p.copy(limit = 10, eps = 0.0)
    val survivors = CPSJoinLocal.bruteForceStep(bucket, 0.5, pp, nodeSeed = 5L,
      NullStats, (_, _, _) => (), useExactAvg = true)
    val survivorIds = survivors.map(_.id).toSet
    assert(!survivorIds.exists(_ < 60L), "every clone has avg similarity > (1-ε)λ and must be removed")
    assert(survivorIds.contains(999L), "the far point must continue in the recursion")
  }

  test("brute-forced points report their true pairs exactly once") {
    val base = (0 until 30).toArray
    val clones = (0 until 50).map(i => SetRec(i.toLong, (base :+ (100 + i)).sorted))
    val hasher = new MinHasher(64, 4, seed = 3)
    val bucket = EmbeddedRec.embedAll(clones.toIndexedSeq, hasher).toIndexedSeq
    val pp = p.copy(limit = 10, eps = 0.0)
    val emitted = scala.collection.mutable.ArrayBuffer.empty[(Long, Long)]
    CPSJoinLocal.bruteForceStep(bucket, 0.5, pp, nodeSeed = 5L, NullStats,
      (a, b, _) => emitted += ((math.min(a, b), math.max(a, b))), useExactAvg = true)
    assert(emitted.size == emitted.distinct.size, "no duplicate pair reports within a node")
    assert(emitted.toSet == TestUtil.bruteTruth(clones, 0.5).keySet)
  }

  test("bruteForceStep within limit reports the exact bucket join") {
    val recs = TestUtil.randomRecords(30, 10, 40, seed = 25)
    val hasher = new MinHasher(64, 4, seed = 3)
    val bucket = EmbeddedRec.embedAll(recs, hasher).toIndexedSeq
    val emitted = scala.collection.mutable.HashSet.empty[(Long, Long)]
    val surv = CPSJoinLocal.bruteForceStep(bucket, 0.5, p.copy(limit = 30), 1L, NullStats,
      (a, b, _) => emitted += ((math.min(a, b), math.max(a, b))))
    assert(surv.isEmpty)
    val strong = TestUtil.bruteTruth(recs, 0.65).keySet
    assert(strong.subsetOf(emitted))
  }

  // Recall/precision across dataset archetypes and thresholds.
  for {
    name <- Seq("DBLP", "NETFLIX", "UNIFORM005", "BMS-POS")
    lambda <- Seq(0.5, 0.7, 0.9)
  } test(s"recall >= 0.8 and precision = 1 on $name at λ=$lambda (10 reps)") {
    val recs = Datasets.byName(name).gen(scale = 0.2, seed = 31).toIndexedSeq
    val truth = TestUtil.bruteTruth(recs, lambda)
    val res = CPSJoinLocal.selfJoinRaw(recs, lambda, p)
    TestUtil.assertPerfectPrecision(res, recs, lambda)
    val rec = TestUtil.recall(res.keySet, truth.keySet)
    assert(rec >= 0.8, s"recall $rec below 0.8 (|truth|=${truth.size}, |found|=${res.size})")
  }

  test("TOKENS10K planted pairs are recovered at λ=0.8") {
    val recs = Datasets.byName("TOKENS10K").gen(scale = 0.4, seed = 31).toIndexedSeq
    val truth = TestUtil.bruteTruth(recs, 0.8)
    assert(truth.nonEmpty, "TOKENS generator must plant high-similarity pairs")
    val res = CPSJoinLocal.selfJoinRaw(recs, 0.8, p)
    val rec = TestUtil.recall(res.keySet, truth.keySet)
    assert(rec >= 0.8, s"recall $rec")
    TestUtil.assertPerfectPrecision(res, recs, 0.8)
  }

  test("stats counters are populated and ordered pre >= cand >= reported") {
    val recs = TestUtil.randomRecords(400, 15, 80, seed = 26, spread = 5)
    val stats = new LocalStats
    CPSJoinLocal.selfJoinRaw(recs, 0.5, p, stats)
    assert(stats.pre > 0)
    assert(stats.pre >= stats.cand)
    assert(stats.cand >= 0 && stats.res <= stats.cand)
  }
}
