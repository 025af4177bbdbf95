package repro.bench

import repro.SparkSpec
import repro.harness.Experiments

/** Reproduces Fig. 6: the fraction of YCSB workload-C queries whose query
  * time improves thanks to data skipping, per budget. Paper: 37%-68%.
  */
class SkippingFractionBench extends SparkSpec {

  private val rows = sys.env.getOrElse("CIAO_BENCH_ROWS", "40000").toInt

  test("Fig 6: a substantial fraction of 'challenging' workload queries still benefit") {
    val res = Experiments.skippingFraction(spark, rows, budgets = Seq(0.1, 0.25, 0.5, 1.0))
    println("== Fig 6 (paper: 37%-68% of queries improved) ==")
    println(Experiments.formatSkipFrac(res))
    res.foreach { r =>
      assert(r.fracImproved >= 0.0 && r.fracImproved <= 1.0)
      assert(r.nExec === 30)
    }
    // At the largest budget enough predicates are pushed that a noticeable
    // share of individual queries benefits even though the aggregate does not.
    val atMax = res.maxBy(_.budget)
    assert(atMax.fracImproved > 0.15, s"expected >15% improved, got ${atMax.fracImproved}")
  }
}
