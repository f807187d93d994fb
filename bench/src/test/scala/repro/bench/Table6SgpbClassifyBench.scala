package repro.bench

/** Reproduces paper Table 6: the SGPB query classification — every
  * column is computed by the analyzer, and the free-connex column must
  * match the paper exactly.
  */
class Table6SgpbClassifyBench extends BenchHarness {
  test("Table 6 — SGPB classification") {
    val t = Bench.table6(spark)
    show(t)
    val fcByName = t.rows.map(r => r.cells(0) -> r.cells(4)).toMap
    val paperFc = Map(
      "q1a" -> "Yes", "q1b" -> "Yes", "q1c" -> "Yes", "q2a" -> "Yes",
      "q2b" -> "Yes", "q3a" -> "Yes", "q3b" -> "Yes", "q3c" -> "Yes",
      "q4a" -> "Yes", "q4b" -> "Yes", "q5a" -> "Yes", "q5b" -> "Yes",
      "q6" -> "No", "q7" -> "No", "q8" -> "No", "q9" -> "No")
    assert(fcByName == paperFc)
  }
}
