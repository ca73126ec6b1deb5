package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoint reproducing Table III (CPSJoin parameter settings
  * and the parameter-sensitivity sweep of Fig. 3 in tabular form).
  * Usage: spark-submit --class repro.jobs.Table3Job repro.jar [scale]
  */
object Table3Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    val spark = SparkSession.builder.appName("repro-table3").getOrCreate()
    try println(Tables.table3(spark, scale))
    finally spark.stop()
  }
}
