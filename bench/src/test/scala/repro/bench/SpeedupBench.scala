package repro.bench

/** The Fig. 9 headline sweep: native vs Yannakakis vs Yannakakis+ across
  * SGPB + LSQB + TPC-H (including the §1 5-copy TPC-H Q9 story), with
  * per-query and aggregate speedups.
  */
class SpeedupBench extends BenchHarness {
  test("Fig. 9 headline — cross-benchmark speedups") {
    val t = Bench.speedups(spark,
      sgpbEdges = sys.env.getOrElse("BENCH_SGPB_EDGES", "20000").toLong,
      lsqbSf = sys.env.getOrElse("BENCH_LSQB_SF", "0.3").toDouble,
      tpchSf = sys.env.getOrElse("BENCH_TPCH_SF", "0.02").toDouble)
    show(t)
    assert(t.rows.size == 16 + 9 + 5 + 1)
    // shape check: Yannakakis+ beats classic Yannakakis on average
    val yOverPlus = t.rows.dropRight(1).map(_.cells(5).stripSuffix("x").toDouble)
    assert(yOverPlus.sum / yOverPlus.size > 1.0, yOverPlus)
  }
}
