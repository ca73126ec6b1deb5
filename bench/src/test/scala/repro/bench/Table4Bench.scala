package repro.bench

import repro.SparkSpec
import java.nio.file.{Files, Paths}
import java.nio.charset.StandardCharsets

/** Reproduces Table IV (pre-candidates, candidates and results for AllPairs
  * and CPSJoin at λ ∈ {0.5, 0.7}, CPSJoin at ≥ 90 % recall).
  */
class Table4Bench extends SparkSpec {
  test("Table IV — candidate statistics") {
    val out = Tables.table4(spark)
    println(out)
    Files.createDirectories(Paths.get("results"))
    Files.write(Paths.get("results/table4.txt"), out.getBytes(StandardCharsets.UTF_8))
    assert(out.linesIterator.size >= 2)
  }
}
