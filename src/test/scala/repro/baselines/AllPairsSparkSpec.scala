package repro.baselines

import repro.{Oracle, SparkSpec, TestUtil}
import repro.core.SetRec
import repro.data.Datasets
import org.apache.spark.sql.DataFrame

class AllPairsSparkSpec extends SparkSpec {

  /** Ground-truth join in SQL (DuckDB side of the oracle): pairs of records
    * sharing tokens whose Jaccard similarity reaches λ.
    */
  private def truthSql(lambda: Double): String =
    s"""
       |WITH tok AS (SELECT CAST(id AS BIGINT) AS id, token FROM tokens),
       |     sz  AS (SELECT CAST(id AS BIGINT) AS id, CAST(sz AS DOUBLE) AS sz FROM sizes),
       |     ov  AS (
       |       SELECT a.id AS id1, b.id AS id2, COUNT(*) AS inter
       |       FROM tok a JOIN tok b ON a.token = b.token AND a.id < b.id
       |       GROUP BY a.id, b.id
       |     )
       |SELECT ov.id1 AS id1, ov.id2 AS id2
       |FROM ov JOIN sz s1 ON s1.id = ov.id1 JOIN sz s2 ON s2.id = ov.id2
       |WHERE CAST(ov.inter AS DOUBLE) / (s1.sz + s2.sz - ov.inter) >= $lambda - 1e-12
       |""".stripMargin

  private def tokensDf(recs: Seq[SetRec]): DataFrame = {
    import spark.implicits._
    recs.flatMap(r => r.tokens.map(t => (r.id, t))).toDF("id", "token")
  }

  private def sizesDf(recs: Seq[SetRec]): DataFrame = {
    import spark.implicits._
    recs.map(r => (r.id, r.tokens.length)).toDF("id", "sz")
  }

  for ((name, scale, lambda) <- Seq(("DBLP", 0.03, 0.5), ("UNIFORM005", 0.04, 0.5),
                                    ("BMS-POS", 0.03, 0.7), ("TOKENS10K", 0.05, 0.8),
                                    ("AOL", 0.03, 0.6)))
    test(s"oracle: AllPairsSpark equals the DuckDB ground-truth join on $name at λ=$lambda") {
      val recs = Datasets.byName(name).gen(scale, seed = 101).toIndexedSeq
      val res = AllPairsSpark.selfJoin(spark, AllPairsSpark.toDF(spark, recs.toSeq), lambda)
      val pairsDf = res.pairs.select("id1", "id2")
      Oracle.assertEquivalent(pairsDf, truthSql(lambda),
        "tokens" -> tokensDf(recs), "sizes" -> sizesDf(recs))
      res.pairs.unpersist(blocking = false)
    }

  for (lambda <- Seq(0.5, 0.7, 0.9))
    test(s"AllPairsSpark equals AllPairsLocal at λ=$lambda") {
      val recs = TestUtil.randomRecords(250, 12, 60, seed = 102, spread = 6)
      val (dist, _, _) = AllPairsSpark.selfJoinCollect(spark, recs, lambda)
      val local = AllPairsLocal.selfJoin(recs, lambda)
      assert(dist.keySet == local.keySet)
      for ((k, v) <- dist) assert(math.abs(v - local(k)) < 1e-12)
    }

  test("counters: pre-candidates >= candidates >= results") {
    val recs = TestUtil.randomRecords(300, 12, 50, seed = 103, spread = 4)
    val (pairs, pre, cand) = AllPairsSpark.selfJoinCollect(spark, recs, 0.5)
    assert(pre >= cand && cand >= pairs.size)
    assert(pairs.nonEmpty, "dense universe should produce results")
  }

  test("exactness on a dataset with heavy duplicates") {
    val base = TestUtil.randomRecords(50, 10, 40, seed = 104)
    val recs = base ++ base.map(r => SetRec(r.id + 1000, r.tokens))
    val (dist, _, _) = AllPairsSpark.selfJoinCollect(spark, recs, 0.9)
    val truth = TestUtil.bruteTruth(recs, 0.9)
    assert(dist.keySet == truth.keySet)
  }
}
