package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import java.util.SplittableRandom

class MinHashSpec extends AnyFunSuite {

  test("embed is deterministic in the seed") {
    val h1 = new MinHasher(32, 2, seed = 5)
    val h2 = new MinHasher(32, 2, seed = 5)
    val tokens = Array(3, 17, 99, 256, 70000)
    val (mh1, sk1) = h1.embed(tokens)
    val (mh2, sk2) = h2.embed(tokens)
    assert(mh1.sameElements(mh2) && sk1.sameElements(sk2))
  }

  test("different seeds give different embeddings") {
    val h1 = new MinHasher(32, 2, seed = 5)
    val h2 = new MinHasher(32, 2, seed = 6)
    val tokens = Array(3, 17, 99, 256, 70000)
    assert(!h1.minhash(tokens).sameElements(h2.minhash(tokens)))
  }

  test("minhash values are elements of the input set") {
    val h = new MinHasher(64, 1, seed = 1)
    val tokens = Array(2, 5, 11, 23, 47)
    val mh = h.minhash(tokens)
    assert(mh.forall(tokens.contains))
    assert(mh.length == 64)
  }

  test("embed rejects the empty set") {
    val h = new MinHasher(8, 1, seed = 1)
    intercept[IllegalArgumentException](h.embed(Array.empty[Int]))
  }

  test("identical sets have identical minhash vectors and sketches") {
    val h = new MinHasher(64, 4, seed = 2)
    val tokens = Array(1, 9, 100, 5000)
    val (mh1, sk1) = h.embed(tokens)
    val (mh2, sk2) = h.embed(tokens.clone())
    assert(mh1.sameElements(mh2) && sk1.sameElements(sk2))
  }

  test("minwise property: coordinate agreement rate approximates Jaccard") {
    // Average over many independent hashers to test the *family*, not one draw.
    for ((inter, union) <- Seq((9, 11), (5, 9), (3, 11), (1, 9))) {
      val (x, y) = TestUtil.pairWithJaccard(inter, union)
      val j = inter.toDouble / union
      var agree = 0
      var total = 0
      for (seed <- 0 until 20) {
        val h = new MinHasher(64, 0, seed = 1000 + seed)
        val a = h.minhash(x.tokens); val b = h.minhash(y.tokens)
        for (i <- 0 until 64) { if (a(i) == b(i)) agree += 1; total += 1 }
      }
      val rate = agree.toDouble / total
      assert(math.abs(rate - j) < 0.05, s"agreement $rate vs J=$j for ($inter/$union)")
    }
  }

  test("sketch bit agreement rate approximates (1+J)/2") {
    for ((inter, union) <- Seq((9, 11), (3, 11))) {
      val (x, y) = TestUtil.pairWithJaccard(inter, union)
      val j = inter.toDouble / union
      var agree = 0L
      var total = 0L
      for (seed <- 0 until 10) {
        val h = new MinHasher(1, 8, seed = 2000 + seed)
        val (_, sa) = h.embed(x.tokens)
        val (_, sb) = h.embed(y.tokens)
        agree += 512 - Sketch.hamming(sa, sb)
        total += 512
      }
      val rate = agree.toDouble / total
      assert(math.abs(rate - (1 + j) / 2) < 0.05, s"bit agreement $rate vs ${(1 + j) / 2}")
    }
  }

  test("disjoint sets agree on roughly half the sketch bits") {
    val x = (0 until 50).toArray
    val y = (100 until 150).toArray
    var agree = 0L
    for (seed <- 0 until 10) {
      val h = new MinHasher(1, 8, seed = 3000 + seed)
      agree += 512 - Sketch.hamming(h.embed(x)._2, h.embed(y)._2)
    }
    val rate = agree.toDouble / 5120
    assert(math.abs(rate - 0.5) < 0.05, s"disjoint-set bit agreement $rate")
  }

  test("embedAll preserves ids and tokens") {
    val recs = TestUtil.randomRecords(50, 10, 100, seed = 4)
    val h = new MinHasher(16, 1, seed = 1)
    val emb = EmbeddedRec.embedAll(recs, h)
    assert(emb.length == 50)
    for ((e, r) <- emb.zip(recs)) {
      assert(e.id == r.id)
      assert(e.tokens.sameElements(r.tokens))
      assert(e.mh.length == 16 && e.sketch.length == 1)
    }
  }

  test("singleton sets collide in minhash iff equal") {
    val h = new MinHasher(16, 1, seed = 9)
    val a = h.minhash(Array(42))
    val b = h.minhash(Array(42))
    val c = h.minhash(Array(43))
    assert(a.sameElements(b))
    assert(!a.sameElements(c))
  }
}
