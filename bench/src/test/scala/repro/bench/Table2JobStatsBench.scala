package repro.bench

/** Reproduces paper Table 2: JOB running-time statistics (Max / Mean /
  * Median / StdDev) for native vs Yannakakis vs Yannakakis+, on SparkSQL
  * and DuckDB.
  */
class Table2JobStatsBench extends BenchHarness {
  test("Table 2 — JOB-lite statistics") {
    val (perQuery, stats) = Bench.table2(spark,
      mult = sys.env.getOrElse("BENCH_JOB_MULT", "2.0").toDouble)
    show(perQuery); show(stats)
    assert(perQuery.rows.size == 12)
    assert(stats.rows.size == 6) // 3 methods × 2 engines
  }
}
