package repro.bench

import repro.SparkSpec
import repro.harness.Experiments

/** Reproduces the §VII-D end-to-end experiments (data behind Figs. 3/4/5):
  * per dataset, workloads A/B/C under a client-budget sweep, reporting
  * prefilter/load/query times and speedups vs the zero-budget baseline.
  *
  * Shape expectations from the paper:
  *  - workload A (high skew/overlap) employs partial loading even at small
  *    budgets and gains the most;
  *  - workload B needs a larger budget before partial loading activates;
  *  - workload C (uniform) never partially loads and gains little.
  */
class EndToEndBench extends SparkSpec {

  private val rows    = sys.env.getOrElse("CIAO_BENCH_ROWS", "40000").toInt
  private val budgets = Seq(0.0, 0.1, 0.25, 0.5, 1.0)

  private def runDataset(name: String): Vector[Experiments.E2ERow] = {
    val res = Experiments.endToEnd(spark, name, rows, budgets, verifyCounts = true)
    println(Experiments.formatE2E(res))
    res
  }

  private def checkShape(res: Vector[Experiments.E2ERow], name: String): Unit = {
    val a = res.filter(_.workload == "A")
    val c = res.filter(_.workload == "C")
    val aMax = a.maxBy(_.budget)
    assert(aMax.partial, s"$name/A: partial loading should be on at budget 1.0")
    assert(aMax.loadedRatio < 1.0, s"$name/A: some rows should stay raw")
    assert(aMax.nSelected > 0)
    assert(c.forall(r => !r.partial || r.budget == 0.0),
      s"$name/C: uniform low-overlap workload should not partially load")
    // budget 0 rows are the baseline: speedups exactly 1
    res.filter(_.budget == 0.0).foreach { r =>
      assert(math.abs(r.e2eSpeedup - 1.0) < 1e-9)
      assert(r.nSelected === 0)
    }
    // selection is monotone in budget per workload
    for (wl <- Seq("A", "B", "C")) {
      val sel = res.filter(_.workload == wl).sortBy(_.budget).map(_.nSelected)
      assert(sel === sel.sorted, s"$name/$wl: selection not monotone: $sel")
    }
  }

  test("end-to-end: Windows System Log dataset (Fig. 3)") {
    checkShape(runDataset("winlog"), "winlog")
  }

  test("end-to-end: Yelp Review dataset (Fig. 4)") {
    checkShape(runDataset("yelp"), "yelp")
  }

  test("end-to-end: YCSB dataset (Fig. 5)") {
    checkShape(runDataset("ycsb"), "ycsb")
  }
}
