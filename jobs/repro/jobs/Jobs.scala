package repro.jobs

import org.apache.spark.sql.SparkSession

import repro.harness.Experiments

/** Shared session bootstrap for the spark-submit entrypoints. */
private[jobs] object JobSession {
  def create(app: String): SparkSession =
    SparkSession.builder()
      .master(sys.env.getOrElse("SPARK_MASTER", "local[*]"))
      .appName(app)
      .config("spark.sql.autoBroadcastJoinThreshold", -1)
      .getOrCreate()

  def rowsArg(args: Array[String], default: Int): Int =
    args.headOption.map(_.toInt).getOrElse(default)
}

/** End-to-end budget sweep (data behind Figs. 3/4/5).
  * Usage: spark-submit --class repro.jobs.EndToEndJob repro.jar [rows] [dataset...]
  */
object EndToEndJob {
  def main(args: Array[String]): Unit = {
    val spark    = JobSession.create("ciao-e2e")
    val rows     = JobSession.rowsArg(args, 60000)
    val datasets = if (args.length > 1) args.drop(1).toSeq else Seq("yelp", "winlog", "ycsb")
    val budgets  = Seq(0.0, 0.1, 0.25, 0.5, 1.0)
    datasets.foreach { d =>
      val res = Experiments.endToEnd(spark, d, rows, budgets)
      println(Experiments.formatE2E(res))
    }
    spark.stop()
  }
}

/** Fraction of YCSB workload-C queries improved by skipping (Fig. 6). */
object SkippingFractionJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("ciao-fig6")
    val rows  = JobSession.rowsArg(args, 60000)
    println(Experiments.formatSkipFrac(
      Experiments.skippingFraction(spark, rows, Seq(0.1, 0.25, 0.5, 1.0))))
    spark.stop()
  }
}

/** Selectivity / overlap / skewness micro-benchmarks (Figs. 7-12). */
object MicroBenchJob {
  def main(args: Array[String]): Unit = {
    val spark = JobSession.create("ciao-micro")
    val rows  = JobSession.rowsArg(args, 40000)
    println(Experiments.formatMicro("Figs 7/8: selectivity", Experiments.microSelectivity(spark, rows)))
    println(Experiments.formatMicro("Figs 9/10: overlap", Experiments.microOverlap(spark, rows)))
    println(Experiments.formatMicro("Figs 11/12: skewness", Experiments.microSkewness(spark, rows)))
    spark.stop()
  }
}

/** Cost-model calibration across three platform regimes (Table IV). */
object CostModelJob {
  def main(args: Array[String]): Unit = {
    println(Experiments.formatCostModel(Experiments.costModelTable()))
  }
}

/** Tables I / II / III reproduction (predicates, pools, workload stats). */
object WorkloadTablesJob {
  def main(args: Array[String]): Unit = {
    println("== Table I: supported predicates and pattern strings ==")
    println(Experiments.formatTableI())
    println("\n== Table II: predicate templates and candidate counts ==")
    println(Experiments.formatTableII())
    println("\n== Table III: end-to-end workloads ==")
    println(Experiments.formatTableIII())
  }
}
