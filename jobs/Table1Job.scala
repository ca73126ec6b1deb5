package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Tables

/** spark-submit entrypoint reproducing Table I (dataset statistics).
  * Usage: spark-submit --class repro.jobs.Table1Job repro.jar [scale]
  */
object Table1Job {
  def main(args: Array[String]): Unit = {
    val scale = args.headOption.map(_.toDouble).getOrElse(1.0)
    // Table I needs no Spark computation, but a session is created for
    // interface uniformity with the other jobs.
    val spark = SparkSession.builder.appName("repro-table1").getOrCreate()
    try println(Tables.table1(scale))
    finally spark.stop()
  }
}
