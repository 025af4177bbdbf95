package repro.workload

import org.scalatest.funsuite.AnyFunSuite

import repro.core._

/** Predicate pools must match Table II template-by-template. */
class PredicatePoolSpec extends AnyFunSuite {

  private val yelp   = PredicatePool.yelp()
  private val winlog = PredicatePool.winlog()
  private val ycsb   = PredicatePool.ycsb()

  test("Table II: yelp template candidate counts") {
    val c = PredicatePool.templateCounts(yelp)
    assert(c("useful = <int>") === 100)
    assert(c("cool = <int>") === 100)
    assert(c("funny = <int>") === 100)
    assert(c("stars = <int>") === 5)
    assert(c("user_id = <string>") === 5)
    assert(c("text LIKE <string>") === 5)
    assert(c("date LIKE (year)") === 14)
    assert(c("date LIKE (month)") === 12)
    assert(yelp.size === 341)
  }

  test("Table II: windows log template candidate counts") {
    val c = PredicatePool.templateCounts(winlog)
    assert(c("info LIKE <string>") === 200)
    assert(c("time LIKE (month)") === 12)
    assert(c("time LIKE (day)") === 31)
    assert(c("time LIKE (hour)") === 24)
    assert(c("time LIKE (minute)") === 60)
    assert(c("time LIKE (second)") === 60)
    assert(winlog.size === 387)
  }

  test("Table II: YCSB template candidate counts") {
    val c = PredicatePool.templateCounts(ycsb)
    assert(c("isActive = <boolean>") === 2)
    assert(c("linear_score = <int>") === 100)
    assert(c("weighted_score = <int>") === 100)
    assert(c("phone_country = <string>") === 3)
    assert(c("age_group = <string>") === 4)
    assert(c("age_by_group = <int>") === 100)
    assert(c("url_domain LIKE <string>") === 12)
    assert(c("url_site LIKE <string>") === 14)
    assert(c("email LIKE <string>") === 2)
    assert(ycsb.size === 337)
  }

  test("pool clauses are unique within each dataset") {
    for (pool <- Seq(yelp, winlog, ycsb))
      assert(pool.map(_.clause.canonical).distinct.size === pool.size)
  }

  test("candidate kinds follow the templates (= → kv/exact, LIKE → substring)") {
    assert(yelp.filter(_.template == "stars = <int>").forall(_.clause.atoms.head.isInstanceOf[KeyValueMatch]))
    assert(yelp.filter(_.template == "user_id = <string>").forall(_.clause.atoms.head.isInstanceOf[ExactMatch]))
    assert(winlog.forall(_.clause.atoms.head.isInstanceOf[SubstringMatch]))
    assert(ycsb.filter(_.template == "isActive = <boolean>").forall(_.clause.atoms.head.isInstanceOf[KeyValueMatch]))
  }

  test("selectivity estimation reflects sample frequencies") {
    val ds   = JsonDatasets.yelp(2000, seed = 12)
    val sels = PredicatePool.estimateSelectivities(yelp, ds.lines)
    val starsSel = (1 to 5).map(v => sels(Clause(KeyValueMatch("stars", v.toString)).canonical)).sum
    assert(math.abs(starsSel - 1.0) < 1e-9, "stars=1..5 partitions the dataset")
    val monthSel = (1 to 12).map(m => sels(Clause(SubstringMatch("date", f"-$m%02d-")).canonical)).sum
    assert(monthSel > 0.99 && monthSel < 1.2, "months cover all rows (a few false-positive-ish overlaps allowed)")
    sels.values.foreach(s => assert(s >= 0.0 && s <= 1.0))
  }

  test("selectivities vary across candidates (skewed vote counts)") {
    val ds   = JsonDatasets.yelp(3000, seed = 13)
    val sels = PredicatePool.estimateSelectivities(yelp, ds.lines)
    val useful0  = sels(Clause(KeyValueMatch("useful", "0")).canonical)
    val useful90 = sels(Clause(KeyValueMatch("useful", "90")).canonical)
    assert(useful0 > 0.2, s"useful=0 common, got $useful0")
    assert(useful90 < 0.01, s"useful=90 rare, got $useful90")
  }

  test("byName dispatches") {
    assert(PredicatePool.byName("yelp").size === 341)
    assert(PredicatePool.byName("winlog").size === 387)
    assert(PredicatePool.byName("ycsb").size === 337)
    intercept[IllegalArgumentException](PredicatePool.byName("x"))
  }
}
