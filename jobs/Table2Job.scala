package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoint reproducing Table II (join times for CPSJoin,
  * MinHash LSH and AllPairs at ≥ 90 % recall).
  * Usage: spark-submit --class repro.jobs.Table2Job repro.jar [scale]
  * Dataset subset via REPRO_DATASETS=AOL,DBLP,... .
  */
object Table2Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder.appName("repro-table2").getOrCreate()
    try println(Tables.table2(spark, scale))
    finally spark.stop()
  }
}
