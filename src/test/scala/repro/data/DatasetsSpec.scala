package repro.data

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core.Jaccard

class DatasetsSpec extends AnyFunSuite {

  test("registry contains all 14 evaluation datasets in Table I order") {
    assert(Datasets.all.map(_.name) == IndexedSeq(
      "AOL", "BMS-POS", "DBLP", "ENRON", "FLICKR", "KOSARAK", "LIVEJ",
      "NETFLIX", "ORKUT", "SPOTIFY", "TOKENS10K", "TOKENS15K", "TOKENS20K", "UNIFORM005"))
    assert(Datasets.byName("dblp").name == "DBLP")
    intercept[NoSuchElementException](Datasets.byName("NOPE"))
  }

  test("stats computes n, average size and sets/token on a known input") {
    val recs = IndexedSeq(
      repro.core.SetRec(0, Array(1, 2)), repro.core.SetRec(1, Array(1, 2, 3, 4)))
    val (n, avg, ratio) = Datasets.stats(recs)
    assert(n == 2 && avg == 3.0 && math.abs(ratio - 6.0 / 4.0) < 1e-12)
  }

  for (d <- Datasets.all) {
    test(s"${d.name}: records are well-formed, ids unique, deterministic") {
      val recs = d.gen(scale = 0.2, seed = 71)
      assert(recs.nonEmpty)
      assert(recs.map(_.id).distinct.size == recs.size, "duplicate ids")
      for (r <- recs.take(200)) {
        assert(r.tokens.length >= 2, s"record ${r.id} has < 2 tokens")
        assert(r.tokens.toSeq == r.tokens.distinct.sorted.toSeq, "tokens must be sorted distinct")
      }
      val again = d.gen(scale = 0.2, seed = 71)
      assert(recs.map(_.tokens.toSeq) == again.map(_.tokens.toSeq), "generator must be deterministic")
      val other = d.gen(scale = 0.2, seed = 72)
      assert(recs.map(_.tokens.toSeq) != other.map(_.tokens.toSeq), "seed must matter")
    }

    test(s"${d.name}: average set size tracks the paper's Table I value") {
      val recs = d.gen(scale = 0.4, seed = 73)
      val (_, avg, _) = Datasets.stats(recs)
      assert(avg > d.paperAvgSize * 0.55 && avg < d.paperAvgSize * 1.8,
        s"avg set size $avg vs paper ${d.paperAvgSize}")
    }
  }

  test("sets/token ordering separates prefix-friendly from dense datasets") {
    // The key shape property: the datasets the paper calls out as CPSJoin-
    // friendly (dense tokens) must have a much higher sets/token ratio at
    // reproduction scale than the prefix-filtering-friendly ones.
    def ratioOf(name: String): Double = {
      val (_, _, r) = Datasets.stats(Datasets.byName(name).gen(scale = 0.8, seed = 74))
      r
    }
    // UNIFORM005's ratio scales with n (fixed universe), so at test scale the
    // margin is narrower than at bench scale — require a 2× separation.
    val dense = Seq("NETFLIX", "BMS-POS", "DBLP", "UNIFORM005", "TOKENS10K").map(ratioOf)
    val sparse = Seq("AOL", "FLICKR", "SPOTIFY", "LIVEJ", "ENRON").map(ratioOf)
    assert(dense.min > 2 * sparse.max,
      s"dense=${dense.map(_.round)} should dominate sparse=${sparse.map(_.round)}")
  }

  test("UNIFORM005 sets average 10 tokens (uniform sizes) over a 209-token universe") {
    val recs = Datasets.byName("UNIFORM005").gen(scale = 0.4, seed = 75)
    assert(recs.forall(r => r.tokens.length >= 2 && r.tokens.length <= 18))
    val avg = recs.map(_.tokens.length).sum.toDouble / recs.size
    assert(math.abs(avg - 10.0) < 1.0, s"avg size $avg")
    assert(recs.flatMap(_.tokens).max < 209)
  }

  test("UNIFORM005 produces join results at λ = 0.5 at bench scale") {
    val recs = Datasets.byName("UNIFORM005").gen(scale = 1.0, seed = 7)
    assert(TestUtil.bruteTruth(recs, 0.5).nonEmpty)
  }

  test("TOKENS datasets plant groups with the prescribed sizes") {
    val recs = Datasets.tokensDataset(n = 300, cap = 100, plantedPerLambda = 5, seed = 76)
    val sizes = recs.map(_.tokens.length)
    // 974 = (2·0.95/1.95)·1000 for λ' = 0.95, 919 for λ' = 0.85; 333 bulk.
    assert(sizes.count(_ > 950) == 5, "λ' = 0.95 group")
    assert(sizes.count(s => s > 900 && s <= 950) == 5, "λ' = 0.85 group")
    assert(sizes.count(s => s > 300 && s < 360) >= 200)
  }

  test("TOKENS planted groups contain pairs near their target similarity") {
    val recs = Datasets.tokensDataset(n = 200, cap = 80, plantedPerLambda = 6, seed = 77)
    val big = recs.filter(_.tokens.length > 900) // λ' = 0.95 group
    val sims = for (i <- big.indices; j <- (i + 1) until big.size)
      yield Jaccard.similarity(big(i).tokens, big(j).tokens)
    assert(sims.nonEmpty && sims.max > 0.9, s"max planted similarity ${sims.max}")
  }

  test("TOKENS bulk pairs sit near expected Jaccard 0.2") {
    val recs = Datasets.tokensDataset(n = 300, cap = 100, plantedPerLambda = 0, seed = 78)
    val bulk = recs.filter(_.tokens.length < 400).take(40)
    val sims = for (i <- bulk.indices; j <- (i + 1) until bulk.size)
      yield Jaccard.similarity(bulk(i).tokens, bulk(j).tokens)
    val avg = sims.sum / sims.size
    assert(math.abs(avg - 0.2) < 0.05, s"bulk average similarity $avg vs 0.2")
  }

  test("TOKENS respects the per-token usage cap while capacity remains") {
    val recs = Datasets.tokensDataset(n = 120, cap = 60, plantedPerLambda = 0, seed = 79)
    val counts = recs.flatMap(_.tokens).groupBy(identity).map(_._2.size)
    // total demand 120·333 ≈ 40k < capacity 60k ⇒ hard cap must hold
    assert(counts.max <= 60, s"token used ${counts.max} > cap 60")
  }

  test("zipf datasets contain near-duplicate planted pairs") {
    val recs = Datasets.zipfDataset(n = 400, avgSize = 20, d = 2000, alpha = 0.8,
      dupFraction = 0.05, seed = 80)
    val truth = TestUtil.bruteTruth(recs, 0.6)
    assert(truth.nonEmpty, "expected planted near-duplicates above 0.6")
  }

  test("zipf token frequencies are skewed (head token much more frequent)") {
    val recs = Datasets.zipfDataset(n = 500, avgSize = 10, d = 1000, alpha = 1.0, seed = 81)
    val freq = recs.flatMap(_.tokens).groupBy(identity).map(_._2.size).toSeq.sorted
    assert(freq.last > 10 * freq.head, s"head=${freq.last} tail=${freq.head}")
  }

  test("dataset scale parameter controls n") {
    val d = Datasets.byName("DBLP")
    assert(d.gen(0.02, 1).size < d.gen(0.1, 1).size)
  }
}
