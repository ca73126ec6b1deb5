package repro.bench

import repro.SparkSpec
import java.nio.file.{Files, Paths}
import java.nio.charset.StandardCharsets

/** Reproduces Table II (join time in seconds for CPSJoin, MinHash LSH and
  * AllPairs with ≥ 90 % recall, λ ∈ {0.5,…,0.9}). Scale with REPRO_SCALE,
  * dataset subset with REPRO_DATASETS.
  */
class Table2Bench extends SparkSpec {
  test("Table II — join times at >=90% recall") {
    val out = Tables.table2(spark)
    println(out)
    Files.createDirectories(Paths.get("results"))
    Files.write(Paths.get("results/table2.txt"), out.getBytes(StandardCharsets.UTF_8))
    assert(out.linesIterator.size >= 2)
  }
}
