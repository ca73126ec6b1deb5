package repro.core

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil

class EmbeddingSpec extends AnyFunSuite {

  test("embed tags each coordinate with its index (fixed size t)") {
    val mh = Array(7, 7, 9)
    val f = Embedding.embed(mh)
    assert(f.length == 3)
    assert(f.toSet.size == 3, "coordinates with equal minhash stay distinct elements")
    assert(f(0) == ((0L << 32) | 7L) && f(2) == ((2L << 32) | 9L))
  }

  test("braunBlanquet of identical vectors is 1, of disjoint-valued vectors 0") {
    assert(Embedding.braunBlanquet(Array(1, 2, 3), Array(1, 2, 3)) == 1.0)
    assert(Embedding.braunBlanquet(Array(1, 2, 3), Array(4, 5, 6)) == 0.0)
    assert(Embedding.braunBlanquet(Array(1, 2), Array(1, 9)) == 0.5)
  }

  test("braunBlanquet requires equal-size embeddings") {
    intercept[IllegalArgumentException](Embedding.braunBlanquet(Array(1), Array(1, 2)))
  }

  test("braunBlanquet equals |f(x) ∩ f(y)| / t") {
    val mhX = Array(3, 5, 5, 9)
    val mhY = Array(3, 6, 5, 1)
    val inter = Embedding.embed(mhX).toSet.intersect(Embedding.embed(mhY).toSet).size
    assert(Embedding.braunBlanquet(mhX, mhY) == inter.toDouble / 4)
  }

  test("concentration: |f(x) ∩ f(y)| ≈ t·J(x,y) (paper §II-A)") {
    for ((inter, union) <- Seq((10, 14), (5, 9), (2, 10))) {
      val (x, y) = TestUtil.pairWithJaccard(inter, union)
      val j = inter.toDouble / union
      val t = 256
      var sum = 0.0
      val trials = 10
      for (seed <- 0 until trials) {
        val h = new MinHasher(t, 0, seed = 500 + seed)
        sum += Embedding.braunBlanquet(h.minhash(x.tokens), h.minhash(y.tokens))
      }
      val avg = sum / trials
      assert(math.abs(avg - j) < 0.06, s"B estimate $avg vs J=$j")
    }
  }
}
