package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoint reproducing Table IV (pre-candidates, candidates
  * and results for AllPairs and CPSJoin at λ ∈ {0.5, 0.7}).
  * Usage: spark-submit --class repro.jobs.Table4Job repro.jar [scale]
  */
object Table4Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder.appName("repro-table4").getOrCreate()
    try println(Tables.table4(spark, scale))
    finally spark.stop()
  }
}
