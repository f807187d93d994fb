package repro.bench

/** Reproduces paper Table 3: the rule-based-optimization ablation
  * (Base / Primitive / PK-FK / Annot / PK-FK & Annot) on JOB 1a and 4a.
  */
class Table3RuleAblationBench extends BenchHarness {
  test("Table 3 — rule ablation on JOB-lite 1a/4a") {
    val t = Bench.table3(spark,
      mult = sys.env.getOrElse("BENCH_JOB_MULT", "2.0").toDouble)
    show(t)
    assert(t.rows.size == 4) // 2 queries × 2 engines
  }
}
