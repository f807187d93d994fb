package repro.bench

/** Reproduces paper Table 4: running times under the three cardinality-
  * estimation scenarios (accurate / estimated / worst-case bounds) versus
  * the native plans, on JOB 2b/8b/11d/17c/27b.
  */
class Table4CardinalityBench extends BenchHarness {
  test("Table 4 — CE scenarios") {
    val t = Bench.table4(spark,
      mult = sys.env.getOrElse("BENCH_JOB_MULT", "2.0").toDouble)
    show(t)
    assert(t.rows.size == 10) // 5 queries × 2 engines
  }
}
