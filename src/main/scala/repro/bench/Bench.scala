package repro.bench

import org.apache.spark.sql.SparkSession
import repro.core._
import repro.duck.DuckRunner
import repro.opt.{PlanEnumerator, Stats, EstimatedCE}
import repro.workloads._

/** Benchmark engine shared by the `bench/` ScalaTest suites and the
  * `jobs/` spark-submit entrypoints: one function per evaluation table of
  * the paper, each returning printable rows (paper-vs-measured numbers
  * are recorded in EXPERIMENTS.md).
  */
object Bench {

  final case class Row(cells: Vector[String])
  final case class Table(title: String, header: Vector[String], rows: Vector[Row]) {
    def render: String = {
      val all = header +: rows.map(_.cells)
      val widths = header.indices.map(i => all.map(_(i).length).max)
      def fmt(r: Vector[String]) =
        r.zip(widths).map { case (c, w) => c.padTo(w, ' ') }.mkString("  ")
      (s"\n=== $title ===" +: fmt(header) +:
        widths.map("-" * _).mkString("  ") +: rows.map(r => fmt(r.cells)))
        .mkString("\n") + "\n"
    }
  }

  def f3(d: Double): String = f"$d%.3f"
  def f2(d: Double): String = f"$d%.2f"

  /** One timed evaluation (planning + execution, like the paper). */
  def timeOnce(w: Workload, m: Runner.Method,
               ceMode: Runner.CeMode = Runner.CeEstimated,
               optimize: Boolean = true): (Double, Long) = {
    val t0 = System.nanoTime()
    val r = Runner.run(w, m, ceMode, optimize)
    val rows = r.df.count()
    val dt = (System.nanoTime() - t0) / 1e9
    r.cleanup()
    (dt, rows)
  }

  def median(w: Workload, m: Runner.Method, reps: Int = 1, warmup: Boolean = true,
             ceMode: Runner.CeMode = Runner.CeEstimated): (Double, Long) = {
    if (warmup) timeOnce(w, m, ceMode)
    val runs = (1 to reps).map(_ => timeOnce(w, m, ceMode))
    (runs.map(_._1).sorted.apply(reps / 2), runs.head._2)
  }

  private def summary(xs: Seq[Double]): (Double, Double, Double, Double) = {
    val s = xs.sorted
    val mean = xs.sum / xs.size
    (s.last, mean, s(s.size / 2),
      math.sqrt(xs.map(x => (x - mean) * (x - mean)).sum / xs.size))
  }

  // ----------------------------------------------------------- Table 2 --

  /** Table 2: JOB running-time statistics per engine × method. */
  def table2(spark: SparkSession, mult: Double = 2.0, withDuck: Boolean = true,
             reps: Int = 1): (Table, Table) = {
    val wls = JobLite.workloads(JobLite.tables(spark, mult)).map {
      case (n, w) => n -> w.cached
    }
    val methods = Seq[Runner.Method](Runner.Native, Runner.Classic, Runner.Plus)
    val perQuery = Vector.newBuilder[Row]
    val sparkTimes: Map[Runner.Method, scala.collection.mutable.Builder[Double, Vector[Double]]] =
      methods.map(m => m -> Vector.newBuilder[Double]).toMap
    val duckTimes: Map[Runner.Method, scala.collection.mutable.Builder[Double, Vector[Double]]] =
      methods.map(m => m -> Vector.newBuilder[Double]).toMap

    val duck = if (withDuck) Some(new DuckRunner) else None

    for ((name, w) <- wls) {
      val cells = Vector.newBuilder[String]
      cells += name
      for (m <- methods) {
        val (t, _) = median(w, m, reps)
        sparkTimes(m) += t
        cells += f3(t)
      }
      duck.foreach { d =>
        // re-load this query's (filtered) instances under its atom ids
        w.instances.foreach { case (id, df) => d.load(id, df) }
        val (_, tn) = d.runNative(w.cq)
        duckTimes(Runner.Native) += tn
        val (cq, inst, cfg, _) = Runner.acyclify(w)
        val cPlan = Yannakakis.plan(cq, JoinTree.defaultTree(cq))
        val (_, tc) = d.runScript(cPlan)
        duckTimes(Runner.Classic) += tc
        val pPlan = Runner.planPlus(cq, inst, cfg, Runner.CeEstimated, optimize = true)
        val (_, tp) = d.runScript(pPlan)
        duckTimes(Runner.Plus) += tp
        cells += f3(tn); cells += f3(tc); cells += f3(tp)
      }
      perQuery += Row(cells.result())
    }
    duck.foreach(_.close())
    wls.foreach(_._2.uncache())

    val header = Vector("query") ++ methods.map(m => s"spark/${m.label}") ++
      (if (withDuck) methods.map(m => s"duck/${m.label}") else Seq.empty)
    val t2a = Table(s"Table 2 -- JOB-lite per-query times (s), mult=$mult",
      header, perQuery.result())

    val statRows = Vector.newBuilder[Row]
    def statRow(engine: String, m: Runner.Method,
                src: Map[Runner.Method, scala.collection.mutable.Builder[Double, Vector[Double]]]): Unit = {
      val xs = src(m).result()
      if (xs.nonEmpty) {
        val (mx, mean, med, sd) = summary(xs)
        statRows += Row(Vector(s"$engine ${m.label}", f3(mx), f3(mean), f3(med), f3(sd)))
      }
    }
    methods.foreach(statRow("SparkSQL", _, sparkTimes))
    if (withDuck) methods.foreach(statRow("DuckDB", _, duckTimes))
    val t2b = Table("Table 2 -- JOB statistics (Max / Mean / Median / StdDev, seconds)",
      Vector("method", "max", "mean", "med", "stddev"), statRows.result())
    (t2a, t2b)
  }

  // ----------------------------------------------------------- Table 3 --

  /** Table 3: rule-based optimization ablation on JOB 1a and 4a. */
  def table3(spark: SparkSession, mult: Double = 2.0, withDuck: Boolean = true): Table = {
    val wls = JobLite.workloads(JobLite.tables(spark, mult))
      .filter(p => p._1 == "1a" || p._1 == "4a").map { case (n, w) => n -> w.cached }
    def variant(w: Workload, agg: Boolean, annot: Boolean): Workload =
      w.copy(cfg = w.cfg.copy(aggElimination = agg, semiJoinElimination = agg,
        annotationPruning = annot))
    val configs = Seq(
      ("Primitive", (w: Workload) => variant(w, agg = false, annot = false)),
      ("PK-FK", (w: Workload) => variant(w, agg = true, annot = false)),
      ("Annot", (w: Workload) => variant(w, agg = false, annot = true)),
      ("PK-FK & Annot", (w: Workload) => variant(w, agg = true, annot = true)))
    val rows = Vector.newBuilder[Row]
    val duck = if (withDuck) Some(new DuckRunner) else None
    for ((name, w) <- wls) {
      val (base, _) = median(w, Runner.Native)
      var sparkCells = Vector(name, "spark", f3(base))
      var duckCells = Vector(name, "duck", "")
      duck.foreach { d =>
        w.instances.foreach { case (id, df) => d.load(id, df) }
        duckCells = Vector(name, "duck", f3(d.runNative(w.cq)._2))
      }
      for ((_, mk) <- configs) {
        val wv = mk(w)
        val (t, _) = median(wv, Runner.Plus)
        sparkCells :+= f3(t)
        duck.foreach { d =>
          val plan = Runner.planPlus(wv.cq, wv.instances, wv.cfg,
            Runner.CeEstimated, optimize = true)
          duckCells :+= f3(d.runScript(plan)._2)
        }
      }
      rows += Row(sparkCells)
      duck.foreach(_ => rows += Row(duckCells))
    }
    duck.foreach(_.close())
    wls.foreach(_._2.uncache())
    Table(s"Table 3 -- rule ablation on JOB-lite 1a/4a (s), mult=$mult",
      Vector("query", "engine", "Base", "Primitive", "PK-FK", "Annot", "PK-FK & Annot"),
      rows.result())
  }

  // ----------------------------------------------------------- Table 4 --

  /** Table 4: running times under the three CE scenarios vs native. */
  def table4(spark: SparkSession, mult: Double = 2.0, withDuck: Boolean = true): Table = {
    val wanted = Set("2b", "8b", "11d", "17c", "27b")
    val wls = JobLite.workloads(JobLite.tables(spark, mult))
      .filter(p => wanted(p._1)).map { case (n, w) => n -> w.cached }
    val scenarios = Seq(
      ("accurate", Runner.CeAccurate), ("estimated", Runner.CeEstimated),
      ("worst-case bounds", Runner.CeWorstCase))
    val rows = Vector.newBuilder[Row]
    val duck = if (withDuck) Some(new DuckRunner) else None
    for ((name, w) <- wls) {
      val (tn, _) = median(w, Runner.Native)
      var sparkCells = Vector(name, "spark", f3(tn))
      var duckCells = Vector(name, "duck", "")
      duck.foreach { d =>
        w.instances.foreach { case (id, df) => d.load(id, df) }
        duckCells = Vector(name, "duck", f3(d.runNative(w.cq)._2))
      }
      for ((_, mode) <- scenarios) {
        val (t, _) = median(w, Runner.Plus, ceMode = mode)
        sparkCells :+= f3(t)
        duck.foreach { d =>
          val plan = Runner.planPlus(w.cq, w.instances, w.cfg, mode, optimize = true)
          duckCells :+= f3(d.runScript(plan)._2)
        }
      }
      rows += Row(sparkCells)
      duck.foreach(_ => rows += Row(duckCells))
    }
    duck.foreach(_.close())
    wls.foreach(_._2.uncache())
    Table(s"Table 4 -- CE scenarios on JOB-lite (s), mult=$mult",
      Vector("query", "engine", "native", "accurate", "estimated", "worst-case bounds"),
      rows.result())
  }

  // ----------------------------------------------------------- Table 5 --

  /** Table 5: optimization time vs query size for 12 representative
    * queries, with native and Yannakakis+ runtimes for context.
    */
  def table5(spark: SparkSession): Table = {
    val sgpb = Seq("q1a", "q6").map(n =>
      s"SGPB-$n" -> Sgpb.workload(spark, n, nEdges = 10000, nVertices = 1500))
    val lsqb = {
      val ts = LsqbLite.workloads(LsqbLite.tables(spark, sf = 0.2))
      Seq("q1", "q5").map(n => s"LSQB-$n" -> ts(n))
    }
    val tpch = {
      val t = TpchLite.tables(spark, sf = 0.01)
      Seq("q3" -> TpchLite.q3(t), "q10" -> TpchLite.q10(t), "q19" -> TpchLite.q19(t))
        .map { case (n, w) => s"TPCH-$n" -> w }
    }
    val job = {
      val ws = JobLite.workloads(JobLite.tables(spark, mult = 0.2)).toMap
      Seq("1a", "10c", "21a", "27c", "6a").map(n => s"JOB-$n" -> ws(n))
    }
    val rows = (sgpb ++ lsqb ++ tpch ++ job).map { case (name, w0) =>
      val w = w0.cached
      val (tn, _) = timeOnce(w, Runner.Native)
      val t0 = System.nanoTime()
      val (cq, inst, cfg, _) = Runner.acyclify(w)
      val stats = Runner.cachedStats(cq, inst)
      val statsSec = (System.nanoTime() - t0) / 1e9
      val t1 = System.nanoTime()
      val choice = PlanEnumerator.best(cq, cfg, new EstimatedCE(cq, stats), stats)
      val planSec = (System.nanoTime() - t1) / 1e9
      val (tp, _) = timeOnce(w, Runner.Plus)
      w.uncache()
      Row(Vector(name, f3(tn), f3(tp), w.cq.atoms.size.toString,
        w.cq.attrSet.size.toString, f"$planSec%.4f", f"$statsSec%.3f",
        choice.candidates.toString))
    }.toVector
    Table("Table 5 -- optimization time per query",
      Vector("query", "native (s)", "yannakakis+ (s)", "#tables", "#attributes",
        "opt-time (s)", "stats-time (s)", "#plans costed"),
      rows)
  }

  // ----------------------------------------------------------- Table 6 --

  /** Table 6: SGPB query classification — all columns *computed* from the
    * query structure by the analyzer.
    */
  def table6(spark: SparkSession): Table = {
    val rows = Sgpb.queries.map { q =>
      val w = Sgpb.workload(spark, q.name, nEdges = 200, nVertices = 50)
      val fc = repro.ghd.GHD.isGeneralizedFreeConnex(w.cq)
      Row(Vector(q.name, w.shape, w.queryType, w.predicates.toString,
        if (fc) "Yes" else "No"))
    }.toVector
    Table("Table 6 -- SGPB query classification (computed)",
      Vector("query", "shape", "type", "predicates", "free-connex"), rows)
  }

  // ------------------------------------------------- Fig. 9 headline ----

  /** The headline sweep: native vs Yannakakis vs Yannakakis+ across
    * SGPB + LSQB + TPCH (incl. the §1 5-copy story), with speedups.
    */
  def speedups(spark: SparkSession, sgpbEdges: Long = 20000,
               lsqbSf: Double = 0.3, tpchSf: Double = 0.02,
               copies: Int = 5): Table = {
    val rows = Vector.newBuilder[Row]
    var improved = 0; var total = 0
    val ratios = Vector.newBuilder[Double]

    def one(name: String, w0: Workload): Unit = {
      val w = w0.cached
      // a DBMS holds table statistics up front; collect them untimed
      Runner.cachedStats(w.cq, w.instances)
      val (tn, _) = timeOnce(w, Runner.Native)
      val (ty, _) = timeOnce(w, Runner.Classic)
      val (tp, _) = timeOnce(w, Runner.Plus)
      w.uncache()
      total += 1
      if (tp < tn) improved += 1
      ratios += tn / tp
      rows += Row(Vector(name, f3(tn), f3(ty), f3(tp), f2(tn / tp) + "x", f2(ty / tp) + "x"))
    }

    Sgpb.queries.foreach(q =>
      one(s"SGPB-${q.name}", Sgpb.workload(spark, q.name, sgpbEdges, sgpbEdges / 8)))
    val lw = LsqbLite.workloads(LsqbLite.tables(spark, lsqbSf))
    (1 to 9).foreach(i => one(s"LSQB-q$i", lw(s"q$i")))
    val t = TpchLite.tables(spark, tpchSf)
    one("TPCH-q9", TpchLite.q9(t))
    one("TPCH-q3", TpchLite.q3(t))
    one("TPCH-q10", TpchLite.q10(t))
    one("TPCH-q19", TpchLite.q19(t))
    val t5 = TpchLite.withCopies(t, copies)
    one(s"TPCH-q9(${copies}copy)", TpchLite.q9(t5, pk = false))

    val rs = ratios.result()
    rows += Row(Vector(s"TOTAL: $improved/$total improved",
      "", "", "", f2(rs.sum / rs.size) + "x avg", f2(rs.max) + "x max"))
    Table("Fig. 9 headline -- native vs Yannakakis vs Yannakakis+ (s)",
      Vector("query", "native", "yannakakis", "yannakakis+",
        "speedup(n/y+)", "speedup(y/y+)"),
      rows.result())
  }
}
