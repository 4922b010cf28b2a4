package repro.bench

import repro.SparkSpec

/** Base for bench suites: shared SparkSession + result echoing. Bench tables
  * are printed to stdout so `sbt "bench/test" | tee bench_output.txt`
  * captures exactly what EXPERIMENTS.md records.
  */
trait BenchSpec extends SparkSpec {
  def echo(table: String): Unit = {
    println()
    println(table)
    println()
  }
}
