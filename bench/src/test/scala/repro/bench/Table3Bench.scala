package repro.bench

import repro.SparkSpec
import java.nio.file.{Files, Paths}
import java.nio.charset.StandardCharsets

/** Reproduces Table III (CPSJoin parameters) together with the parameter
  * sensitivity sweep of Fig. 3 in tabular form (λ = 0.5, recall ≥ 80 %).
  */
class Table3Bench extends SparkSpec {
  test("Table III — parameters and sensitivity sweep") {
    val out = Tables.table3(spark)
    println(out)
    Files.createDirectories(Paths.get("results"))
    Files.write(Paths.get("results/table3.txt"), out.getBytes(StandardCharsets.UTF_8))
    assert(out.contains("limit"))
  }
}
