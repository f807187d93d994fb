package repro.jobs

import org.apache.spark.sql.SparkSession
import repro.bench.Bench

/** Shared spark-submit plumbing for the per-table entrypoints. */
object JobsMain {
  def session(name: String): SparkSession =
    SparkSession.builder
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(name)
      .config("spark.sql.shuffle.partitions",
        sys.env.getOrElse("SPARK_SHUFFLE_PARTITIONS", "64"))
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def run(name: String)(tables: SparkSession => Seq[Bench.Table]): Unit = {
    val spark = session(name)
    try tables(spark).foreach(t => println(t.render))
    finally spark.stop()
  }
}

/** Paper Table 2 — `spark-submit --class repro.jobs.Table2JobStats`. */
object Table2JobStats {
  def main(args: Array[String]): Unit = JobsMain.run("table2") { spark =>
    val mult = args.headOption.map(_.toDouble).getOrElse(2.0)
    val (a, b) = Bench.table2(spark, mult)
    Seq(a, b)
  }
}

/** Paper Table 3 — rule-based optimization ablation. */
object Table3RuleAblation {
  def main(args: Array[String]): Unit = JobsMain.run("table3") { spark =>
    Seq(Bench.table3(spark, args.headOption.map(_.toDouble).getOrElse(2.0)))
  }
}

/** Paper Table 4 — cardinality-estimation scenarios. */
object Table4Cardinality {
  def main(args: Array[String]): Unit = JobsMain.run("table4") { spark =>
    Seq(Bench.table4(spark, args.headOption.map(_.toDouble).getOrElse(2.0)))
  }
}

/** Paper Table 5 — optimization time per query. */
object Table5OptTime {
  def main(args: Array[String]): Unit = JobsMain.run("table5") { spark =>
    Seq(Bench.table5(spark))
  }
}

/** Paper Table 6 — SGPB query classification. */
object Table6SgpbClassify {
  def main(args: Array[String]): Unit = JobsMain.run("table6") { spark =>
    Seq(Bench.table6(spark))
  }
}

/** Fig. 9 headline sweep — native vs Yannakakis vs Yannakakis+. */
object SpeedupSweep {
  def main(args: Array[String]): Unit = JobsMain.run("speedups") { spark =>
    Seq(Bench.speedups(spark))
  }
}
