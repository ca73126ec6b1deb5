package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.core.{Jaccard, SetRec}
import java.util.SplittableRandom

/** Property tests for the correctness core of prefix filtering: under any
  * common token order, two sets with J ≥ λ must share a token within their
  * probing prefixes, and a set must share a token between its probing prefix
  * and the other's indexing prefix when the other is no larger. These are
  * the completeness invariants AllPairs (local and Spark) rely on.
  */
class PrefixFilterPropertySpec extends AnyFunSuite {

  /** Random pair with J ≥ lambda: |x| = |y| = s, intersection ⌈λ/(1+λ)·2s⌉. */
  private def similarPair(s: Int, lambda: Double, rng: SplittableRandom): (Array[Int], Array[Int]) = {
    val minInter = math.ceil(lambda / (1 + lambda) * 2 * s - 1e-9).toInt
    val inter = minInter + (if (minInter < s) rng.nextInt(s - minInter + 1) else 0)
    val universe = rng.ints(0, 1000000).distinct().limit(2L * s).toArray
    val shared = universe.take(inter)
    val x = (shared ++ universe.slice(inter, s)).sorted
    val y = (shared ++ universe.slice(s, 2 * s - inter)).sorted
    (x, y)
  }

  for (lambda <- Seq(0.5, 0.6, 0.7, 0.8, 0.9); s <- Seq(2, 3, 5, 10, 40)) {
    test(s"probing prefixes of any J>=λ pair intersect (λ=$lambda, |x|=$s)") {
      val rng = new SplittableRandom(lambda.hashCode * 31 + s)
      for (trial <- 0 until 50) {
        val (x, y) = similarPair(s, lambda, rng)
        assume(Jaccard.similarity(x, y) >= lambda)
        // any global order: use a random permutation of token ranks
        val order = (x ++ y).distinct.sortBy(t => repro.util.Hashing.mix64(t.toLong + trial))
        val rank = order.zipWithIndex.toMap
        val px = x.sortBy(rank).take(AllPairsLocal.probingPrefixLength(x.length, lambda))
        val py = y.sortBy(rank).take(AllPairsLocal.probingPrefixLength(y.length, lambda))
        assert(px.intersect(py).nonEmpty,
          s"J=${Jaccard.similarity(x, y)} pair escaped probing prefixes (trial $trial)")
      }
    }
  }

  for (lambda <- Seq(0.5, 0.7, 0.9)) {
    test(s"probing prefix of x meets indexing prefix of smaller y (λ=$lambda)") {
      val rng = new SplittableRandom(lambda.hashCode * 17)
      for (trial <- 0 until 100) {
        val s = 4 + rng.nextInt(30)
        val (x0, y0) = similarPair(s, lambda, rng)
        val (x, y) = if (x0.length >= y0.length) (x0, y0) else (y0, x0)
        assume(Jaccard.similarity(x, y) >= lambda)
        val order = (x ++ y).distinct.sortBy(t => repro.util.Hashing.mix64(t.toLong - trial))
        val rank = order.zipWithIndex.toMap
        val px = x.sortBy(rank).take(AllPairsLocal.probingPrefixLength(x.length, lambda))
        val iy = y.sortBy(rank).take(AllPairsLocal.indexingPrefixLength(y.length, lambda))
        assert(px.intersect(iy).nonEmpty,
          "indexing-prefix completeness violated — AllPairs would miss this pair")
      }
    }
  }

  for (lambda <- Seq(0.5, 0.7, 0.9); (sx, sy) <- Seq((10, 4), (20, 9), (8, 3))) {
    test(s"size filter: |y| < λ|x| implies J < λ (λ=$lambda, sizes $sx/$sy)") {
      assume(sy < lambda * sx)
      // maximal possible similarity: y fully contained in x
      val x = (0 until sx).toArray
      val y = (0 until sy).toArray
      assert(Jaccard.similarity(x, y) < lambda)
    }
  }

  for (size <- Seq(2, 5, 17, 100); lambda <- Seq(0.5, 0.7, 0.9)) {
    test(s"removing the probing prefix leaves too little overlap (size=$size, λ=$lambda)") {
      // If two size-s sets share NO probing-prefix token, the overlap is at
      // most s - pp, which is below the λ-threshold ⌈λ/(1+λ)·2s⌉ — the
      // converse direction of the prefix-filter argument.
      val pp = AllPairsLocal.probingPrefixLength(size, lambda)
      val maxOverlapWithoutPrefix = size - pp
      assert(maxOverlapWithoutPrefix < lambda / (1 + lambda) * 2 * size + 1e-9)
    }
  }

  test("SetRec ids survive the AllPairs pipeline on adversarial token ids") {
    // Negative and extreme token ids must not break rank-space mapping.
    val recs = IndexedSeq(
      SetRec(0, Array(Int.MinValue + 1, -5, 0, 7)),
      SetRec(1, Array(Int.MinValue + 1, -5, 0, 9)),
      SetRec(2, Array(Int.MaxValue - 1, Int.MaxValue)))
    val res = AllPairsLocal.selfJoin(recs, 0.5)
    assert(res.keySet == Set((0L, 1L)))
  }
}
