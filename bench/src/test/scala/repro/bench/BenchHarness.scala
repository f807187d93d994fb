package repro.bench

import repro.SparkSpec

/** Thin base for the benchmark suites: the shared SparkSession plus
  * result printing (the printed tables are captured in bench_output.txt
  * and transcribed into EXPERIMENTS.md).
  */
trait BenchHarness extends SparkSpec {
  def show(t: Bench.Table): Unit = println(t.render)
}
