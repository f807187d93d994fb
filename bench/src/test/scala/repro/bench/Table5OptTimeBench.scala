package repro.bench

/** Reproduces paper Table 5: optimization time for 12 representative
  * queries vs their table/attribute counts (and both runtimes for
  * context).
  */
class Table5OptTimeBench extends BenchHarness {
  test("Table 5 — optimization time") {
    val t = Bench.table5(spark)
    show(t)
    assert(t.rows.size == 12)
    // the paper's point: optimization stays in the sub-second range
    val optTimes = t.rows.map(_.cells(5).toDouble)
    assert(optTimes.forall(_ < 10.0), optTimes)
  }
}
