package repro.baselines

import org.scalatest.funsuite.AnyFunSuite
import repro.TestUtil
import repro.core._
import repro.data.Datasets

class BayesLSHLiteSpec extends AnyFunSuite {

  private val p = CPSParams(t = 64, ell = 8, seed = 23)
  private val hasher = new MinHasher(p.t, p.ell, p.seed)
  private def emb(recs: Seq[SetRec]) = EmbeddedRec.embedAll(recs.toIndexedSeq, hasher).toIndexedSeq

  test("normalCdf sanity") {
    assert(math.abs(BayesLSHLite.normalCdf(0.0) - 0.5) < 1e-6)
    assert(math.abs(BayesLSHLite.normalCdf(1.96) - 0.975) < 1e-3)
    assert(math.abs(BayesLSHLite.normalCdf(-1.96) - 0.025) < 1e-3)
    assert(BayesLSHLite.normalCdf(6.0) > 0.999)
  }

  test("posterior is monotone in the number of agreements") {
    val m = 128
    val posts = (0 to m).map(a => BayesLSHLite.posteriorAboveLambda(a, m, 0.5))
    assert(posts.zip(posts.tail).forall { case (a, b) => a <= b + 1e-12 })
  }

  test("posterior concentrates with more evidence") {
    // At agreement rate 0.95 (J ≈ 0.9 > λ = 0.5) more bits → more certainty.
    val few = BayesLSHLite.posteriorAboveLambda(61, 64, 0.5)
    val many = BayesLSHLite.posteriorAboveLambda(486, 512, 0.5)
    assert(many > few)
    // At agreement rate 0.5 (J ≈ 0) more bits → more certain rejection.
    assert(BayesLSHLite.posteriorAboveLambda(256, 512, 0.5) <
           BayesLSHLite.posteriorAboveLambda(32, 64, 0.5))
  }

  test("sketchDecision accepts identical sketches and prunes inverse sketches") {
    val sk = Array.fill(8)(0x0123456789abcdefL)
    assert(BayesLSHLite.sketchDecision(sk, sk, 0.5, BayesLSHLite.Params()))
    val inv = sk.map(~_)
    assert(!BayesLSHLite.sketchDecision(sk, inv, 0.5, BayesLSHLite.Params()))
  }

  test("prefixCandidates is complete: contains every true pair") {
    for (lambda <- Seq(0.5, 0.7, 0.9)) {
      val recs = TestUtil.randomRecords(250, 12, 60, seed = 61, spread = 6)
      val truth = TestUtil.bruteTruth(recs, lambda).keySet
      val cands = BayesLSHLite.prefixCandidates(recs, lambda).toSet
      assert(truth.subsetOf(cands), s"λ=$lambda missing=${truth.diff(cands).take(3)}")
    }
  }

  for {
    name <- Seq("DBLP", "BMS-POS")
    lambda <- Seq(0.5, 0.7)
  } test(s"selfJoin precision = 1 and recall >= 0.85 on $name at λ=$lambda") {
    val recs = Datasets.byName(name).gen(scale = 0.2, seed = 62).toIndexedSeq
    val truth = TestUtil.bruteTruth(recs, lambda)
    val res = BayesLSHLite.selfJoin(emb(recs), lambda)
    TestUtil.assertPerfectPrecision(res, recs, lambda)
    val rec = TestUtil.recall(res.keySet, truth.keySet)
    assert(rec >= 0.85, s"recall $rec (|truth|=${truth.size})")
  }

  test("pruning reduces exact verifications versus verifying all candidates") {
    val recs = Datasets.byName("DBLP").gen(scale = 0.2, seed = 63).toIndexedSeq
    val stats = new LocalStats
    BayesLSHLite.selfJoin(emb(recs), 0.7, BayesLSHLite.Params(), stats)
    val allCandidates = BayesLSHLite.prefixCandidates(recs, 0.7).size
    assert(stats.cand < allCandidates, s"sketch pruning had no effect ($allCandidates candidates)")
  }
}
