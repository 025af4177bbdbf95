package repro.bench

import org.scalatest.funsuite.AnyFunSuite

import repro.harness.Experiments
import repro.workload.{PredicatePool, WorkloadGen}

/** Reproduces Tables I, II and III (workload metadata) and prints them. */
class WorkloadTablesBench extends AnyFunSuite {

  test("Table I: supported predicates and pattern strings") {
    val t = Experiments.formatTableI()
    println("== Table I ==")
    println(t)
    assert(t.contains("\"Bob\"") && t.contains("delicious") && t.contains("\"email\"") && t.contains("\"age\" 10"))
  }

  test("Table II: predicate templates and candidate counts per dataset") {
    val t = Experiments.formatTableII()
    println("== Table II ==")
    println(t)
    // paper totals: yelp 341, winlog 387, ycsb 337
    assert(PredicatePool.yelp().size === 341)
    assert(PredicatePool.winlog().size === 387)
    assert(PredicatePool.ycsb().size === 337)
  }

  test("Table III: workloads A/B/C statistics") {
    val t = Experiments.formatTableIII()
    println("== Table III (paper: A 732 preds 1/8 Zipf1.5, B 617 1/7 Zipf2, C 607 1/10 Uniform) ==")
    println(t)
    val pool = PredicatePool.yelp().map(_.clause)
    for ((label, (qs, _)) <- WorkloadGen.tableIII(pool)) {
      val sizes = qs.map(_.clauses.size)
      assert(qs.size === 200, label)
      assert(sizes.min >= 1, label)
      // ΣPreds in the paper's ballpark (607-732 for E[#preds]=3 over 200 queries)
      assert(sizes.sum > 400 && sizes.sum < 850, s"$label ΣPreds=${sizes.sum}")
    }
  }
}
