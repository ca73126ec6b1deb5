package repro

import repro.core._
import java.util.SplittableRandom

/** Shared helpers for the unit test suites. */
object TestUtil {

  /** Exact ground-truth self-join by brute force (O(n²) — tests only). */
  def bruteTruth(recs: Seq[SetRec], lambda: Double): Map[(Long, Long), Double] = {
    val arr = recs.toArray
    val out = Map.newBuilder[(Long, Long), Double]
    for (i <- arr.indices; j <- (i + 1) until arr.length) {
      val s = Jaccard.similarity(arr(i).tokens, arr(j).tokens)
      if (s >= lambda)
        out += (((math.min(arr(i).id, arr(j).id), math.max(arr(i).id, arr(j).id)), s))
    }
    out.result()
  }

  /** Random records: n sets of `size`±spread tokens from universe [d]. */
  def randomRecords(n: Int, size: Int, d: Int, seed: Long, spread: Int = 0): IndexedSeq[SetRec] = {
    val rng = new SplittableRandom(seed)
    (0 until n).map { i =>
      val sz = math.max(2, size + (if (spread > 0) rng.nextInt(2 * spread + 1) - spread else 0))
      val s = scala.collection.mutable.LinkedHashSet.empty[Int]
      while (s.size < math.min(sz, d)) s += rng.nextInt(d)
      SetRec(i.toLong, s.toArray.sorted)
    }
  }

  /** A pair of sets with exact Jaccard similarity `num/den` (shares `num`
    * of `den` union tokens): |x| = |y|, |x ∩ y| chosen accordingly.
    */
  def pairWithJaccard(inter: Int, union: Int, seed: Long = 1): (SetRec, SetRec) = {
    require(inter <= union)
    val each = (union + inter) / 2 // |x| = |y| = inter + (union - inter)/2
    require((union + inter) % 2 == 0, "need |x| = |y| integral")
    val shared = (0 until inter).toArray
    val onlyX = (inter until each).toArray
    val onlyY = (each until union).toArray
    (SetRec(0, (shared ++ onlyX).sorted), SetRec(1, (shared ++ onlyY).sorted))
  }

  def recall(found: collection.Set[(Long, Long)], truth: collection.Set[(Long, Long)]): Double =
    if (truth.isEmpty) 1.0 else truth.count(found.contains).toDouble / truth.size

  /** Precision must be 1 — every reported pair verified against exact Jaccard. */
  def assertPerfectPrecision(found: Map[(Long, Long), Double], recs: Seq[SetRec], lambda: Double): Unit = {
    val byId = recs.map(r => r.id -> r).toMap
    for (((a, b), sim) <- found) {
      val exact = Jaccard.similarity(byId(a).tokens, byId(b).tokens)
      assert(exact >= lambda, s"pair ($a,$b) reported with sim=$sim but exact=$exact < $lambda")
      assert(math.abs(exact - sim) < 1e-12, s"pair ($a,$b): reported sim $sim != exact $exact")
    }
  }
}
