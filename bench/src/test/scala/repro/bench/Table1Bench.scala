package repro.bench

import repro.SparkSpec
import java.nio.file.{Files, Paths}
import java.nio.charset.StandardCharsets

/** Reproduces Table I (dataset statistics). Output is printed and written to
  * bench/results/table1.txt for EXPERIMENTS.md.
  */
class Table1Bench extends SparkSpec {
  test("Table I — dataset statistics") {
    val out = Tables.table1()
    println(out)
    Files.createDirectories(Paths.get("results"))
    Files.write(Paths.get("results/table1.txt"), out.getBytes(StandardCharsets.UTF_8))
    assert(out.linesIterator.size > Harness.selectedDatasets.size)
  }
}
