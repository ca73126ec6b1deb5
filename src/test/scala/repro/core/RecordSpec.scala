package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import java.util.SplittableRandom

class RecordSpec extends AnyFunSuite {

  test("normalized sorts and dedups tokens") {
    val r = SetRec.normalized(3, Seq(5, 1, 5, 3, 1))
    assert(r.tokens.toSeq == Seq(1, 3, 5))
    assert(r.id == 3 && r.size == 3)
  }

  test("intersectionSize on disjoint, equal and nested sets") {
    assert(Jaccard.intersectionSize(Array(1, 2, 3), Array(4, 5)) == 0)
    assert(Jaccard.intersectionSize(Array(1, 2, 3), Array(1, 2, 3)) == 3)
    assert(Jaccard.intersectionSize(Array(1, 2, 3, 9), Array(2, 9)) == 2)
    assert(Jaccard.intersectionSize(Array.empty[Int], Array(1)) == 0)
  }

  test("similarity basic cases") {
    assert(Jaccard.similarity(Array(1, 2), Array(1, 2)) == 1.0)
    assert(Jaccard.similarity(Array(1, 2), Array(3, 4)) == 0.0)
    assert(Jaccard.similarity(Array(1, 2, 3), Array(2, 3, 4)) == 0.5)
    assert(Jaccard.similarity(Array.empty[Int], Array.empty[Int]) == 1.0)
  }

  test("similarity matches definition on random pairs") {
    val rng = new SplittableRandom(3)
    for (_ <- 0 until 200) {
      val x = (0 until 30).map(_ => rng.nextInt(50)).distinct.sorted.toArray
      val y = (0 until 30).map(_ => rng.nextInt(50)).distinct.sorted.toArray
      val inter = x.toSet.intersect(y.toSet).size
      val union = x.toSet.union(y.toSet).size
      val expected = if (union == 0) 1.0 else inter.toDouble / union
      assert(math.abs(Jaccard.similarity(x, y) - expected) < 1e-15)
    }
  }

  test("similarity is symmetric") {
    val rng = new SplittableRandom(4)
    for (_ <- 0 until 100) {
      val x = (0 until 20).map(_ => rng.nextInt(40)).distinct.sorted.toArray
      val y = (0 until 20).map(_ => rng.nextInt(40)).distinct.sorted.toArray
      assert(Jaccard.similarity(x, y) == Jaccard.similarity(y, x))
    }
  }

  test("overlap threshold is equivalent to the Jaccard threshold") {
    // J >= λ  ⟺  inter >= λ/(1+λ)(|x|+|y|) for all sizes and intersections
    for (sx <- 2 to 20; sy <- 2 to 20; inter <- 0 to math.min(sx, sy); lambda <- Seq(0.5, 0.7, 0.9)) {
      val j = inter.toDouble / (sx + sy - inter)
      val viaOverlap = inter + 1e-9 >= Jaccard.overlapThreshold(sx, sy, lambda)
      assert((j >= lambda - 1e-12) == viaOverlap, s"sx=$sx sy=$sy inter=$inter λ=$lambda")
    }
  }

  test("pairWithJaccard constructs pairs of requested similarity") {
    for ((inter, union) <- Seq((5, 9), (10, 14), (50, 70), (2, 4))) {
      val (x, y) = TestUtil.pairWithJaccard(inter, union)
      assert(math.abs(Jaccard.similarity(x.tokens, y.tokens) - inter.toDouble / union) < 1e-12)
      assert(x.tokens.length == y.tokens.length)
    }
  }
}
