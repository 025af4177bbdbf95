package repro.workload

import repro.core._
import repro.json.JsonParser

/** Predicate pools per dataset, following Table II of the paper exactly:
  * each template expands into its listed number of candidate values, and
  * every candidate is a single-atom [[Clause]].
  */
object PredicatePool {

  /** One pool candidate with its originating Table II template. */
  final case class PoolEntry(template: String, clause: Clause)

  /** Yelp review pool — 100+100+100+5+5+5+14+12 = 341 candidates. */
  def yelp(): Vector[PoolEntry] = {
    val useful = Vector.tabulate(100)(v => PoolEntry("useful = <int>", Clause(KeyValueMatch("useful", v.toString))))
    val cool   = Vector.tabulate(100)(v => PoolEntry("cool = <int>", Clause(KeyValueMatch("cool", v.toString))))
    val funny  = Vector.tabulate(100)(v => PoolEntry("funny = <int>", Clause(KeyValueMatch("funny", v.toString))))
    val stars  = Vector.tabulate(5)(v => PoolEntry("stars = <int>", Clause(KeyValueMatch("stars", (v + 1).toString))))
    val users  = Vector.tabulate(5)(v => PoolEntry("user_id = <string>", Clause(ExactMatch("user_id", f"u$v%03d"))))
    val texts  = JsonDatasets.YelpMarkers.map { case (w, _) =>
      PoolEntry("text LIKE <string>", Clause(SubstringMatch("text", w)))
    }
    val years  = Vector.tabulate(14)(y => PoolEntry("date LIKE (year)", Clause(SubstringMatch("date", (2004 + y).toString))))
    val months = Vector.tabulate(12)(m => PoolEntry("date LIKE (month)", Clause(SubstringMatch("date", f"-${m + 1}%02d-"))))
    useful ++ cool ++ funny ++ stars ++ users ++ texts ++ years ++ months
  }

  /** Windows log pool — 200+12+31+24+60+60 = 387 candidates. */
  def winlog(): Vector[PoolEntry] = {
    val infos   = JsonDatasets.WinlogKeywords.map(kw =>
      PoolEntry("info LIKE <string>", Clause(SubstringMatch("info", kw))))
    val months  = Vector.tabulate(12)(m => PoolEntry("time LIKE (month)", Clause(SubstringMatch("ts", f"-${m + 1}%02d-"))))
    val days    = Vector.tabulate(31)(d => PoolEntry("time LIKE (day)", Clause(SubstringMatch("ts", f"-${d + 1}%02d "))))
    val hours   = Vector.tabulate(24)(h => PoolEntry("time LIKE (hour)", Clause(SubstringMatch("ts", f" $h%02d:"))))
    val minutes = Vector.tabulate(60)(m => PoolEntry("time LIKE (minute)", Clause(SubstringMatch("ts", f":$m%02d:"))))
    val seconds = Vector.tabulate(60)(s => PoolEntry("time LIKE (second)", Clause(SubstringMatch("ts", f":$s%02d,"))))
    infos ++ months ++ days ++ hours ++ minutes ++ seconds
  }

  /** YCSB pool — 2+100+100+3+4+100+12+14+2 = 337 candidates. */
  def ycsb(): Vector[PoolEntry] = {
    val active   = Vector("true", "false").map(b =>
      PoolEntry("isActive = <boolean>", Clause(KeyValueMatch("isActive", b))))
    val linear   = Vector.tabulate(100)(v => PoolEntry("linear_score = <int>", Clause(KeyValueMatch("linear_score", v.toString))))
    val weighted = Vector.tabulate(100)(v => PoolEntry("weighted_score = <int>", Clause(KeyValueMatch("weighted_score", v.toString))))
    val country  = JsonDatasets.YcsbCountries.map(c =>
      PoolEntry("phone_country = <string>", Clause(ExactMatch("phone_country", c))))
    val ageGrp   = JsonDatasets.YcsbAgeGroups.map(g =>
      PoolEntry("age_group = <string>", Clause(ExactMatch("age_group", g))))
    val ageBy    = Vector.tabulate(100)(v => PoolEntry("age_by_group = <int>", Clause(KeyValueMatch("age_by_group", v.toString))))
    val domains  = JsonDatasets.YcsbDomains.map(d =>
      PoolEntry("url_domain LIKE <string>", Clause(SubstringMatch("url_domain", d))))
    val sites    = JsonDatasets.YcsbSites.map(s =>
      PoolEntry("url_site LIKE <string>", Clause(SubstringMatch("url_site", s))))
    val emails   = Vector("@gmail", "@yahoo").map(e =>
      PoolEntry("email LIKE <string>", Clause(SubstringMatch("email", e))))
    active ++ linear ++ weighted ++ country ++ ageGrp ++ ageBy ++ domains ++ sites ++ emails
  }

  /** Pool by dataset name. */
  def byName(name: String): Vector[PoolEntry] = name match {
    case "yelp"   => yelp()
    case "winlog" => winlog()
    case "ycsb"   => ycsb()
    case other    => throw new IllegalArgumentException(s"unknown dataset '$other'")
  }

  /** Table II row counts per template, for the reproduction check. */
  def templateCounts(pool: Vector[PoolEntry]): Map[String, Int] =
    pool.groupBy(_.template).view.mapValues(_.size).toMap

  /** Estimate candidate selectivities by typed evaluation over a sample of
    * parsed objects (the paper: "we estimate the selectivity for each
    * predicate by evaluating them on sampled datasets").
    * Returns clause-canonical → selectivity.
    */
  def estimateSelectivities(pool: Vector[PoolEntry], sampleLines: Seq[String]): Map[String, Double] = {
    val objs = sampleLines.map(JsonParser.parseObject)
    val n    = math.max(1, objs.size)
    pool.map { e =>
      val hits = objs.count(e.clause.evalParsed)
      e.clause.canonical -> hits.toDouble / n
    }.toMap
  }
}
